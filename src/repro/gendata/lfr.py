"""LFR-lite benchmark generator (Lancichinetti–Fortunato–Radicchi [42]).

Full LFR rewires a configuration model under hard per-node mixing
constraints. This implementation keeps the three properties the paper's
sweeps exercise (Table 2 / Figures 8-11):

* truncated power-law degree sequence (exponent tau1, bounded by
  ``d_avg``/``d_max``),
* power-law community sizes in [min_c, max_c] (exponent tau2),
* per-node mixing ``mu``: ≈mu of each node's edges leave its community.

Internal edges use a within-community configuration model; external
edges a cross-community configuration model. Collisions (self loops /
duplicates) are dropped, so realized degrees are approximate — exactly
as in stub-matching generators.

Returns ``(LocalGraph, communities)`` with non-overlapping ground truth.
"""
from __future__ import annotations

from typing import List, Set, Tuple

import numpy as np

from ..graphs.local import LocalGraph


def _powerlaw_ints(rng, n, exponent, lo, hi) -> np.ndarray:
    """n integers in [lo, hi] with P(x) ∝ x^-exponent."""
    xs = np.arange(lo, hi + 1, dtype=np.float64)
    p = xs ** (-float(exponent))
    p /= p.sum()
    return rng.choice(np.arange(lo, hi + 1), size=n, p=p)


def _match_degree_mean(deg: np.ndarray, target_mean: float, hi: int) -> np.ndarray:
    """Rescale a degree sequence toward the target mean, clipped to [1, hi]."""
    scale = target_mean / max(deg.mean(), 1e-9)
    return np.clip(np.round(deg * scale), 1, hi).astype(np.int64)


def lfr_graph(
    n: int = 1000,
    d_avg: float = 16,
    d_max: int = 40,
    mu: float = 0.4,
    min_c: int = 10,
    max_c: int = 200,
    tau1: float = 2.0,
    tau2: float = 1.0,
    seed: int = 0,
) -> Tuple[LocalGraph, List[Set[int]]]:
    rng = np.random.default_rng(seed)
    # --- degree sequence
    deg = _powerlaw_ints(rng, n, tau1, max(1, int(d_avg // 4)), d_max)
    deg = _match_degree_mean(deg.astype(np.float64), d_avg, d_max)
    # --- community sizes covering all n nodes
    sizes: List[int] = []
    while sum(sizes) < n:
        s = int(_powerlaw_ints(rng, 1, tau2, min_c, max_c)[0])
        sizes.append(min(s, n - sum(sizes)))
    if sizes[-1] < min_c and len(sizes) > 1:
        sizes[-2] += sizes[-1]
        sizes.pop()
    # --- assign nodes to communities (random permutation, contiguous blocks)
    perm = rng.permutation(n)
    comms: List[Set[int]] = []
    at = 0
    for s in sizes:
        comms.append(set(int(v) for v in perm[at : at + s]))
        at += s
    comm_of = np.empty(n, dtype=np.int64)
    for ci, c in enumerate(comms):
        for v in c:
            comm_of[v] = ci
    # --- split each node's stubs into internal / external
    internal = np.round(deg * (1.0 - mu)).astype(np.int64)
    external = deg - internal
    g = LocalGraph()
    for v in range(n):
        g.add_node(v)
    # within-community configuration model
    for c in comms:
        stubs: List[int] = []
        for v in c:
            stubs.extend([v] * int(internal[v]))
        stubs_arr = rng.permutation(np.array(stubs, dtype=np.int64))
        for i in range(0, len(stubs_arr) - 1, 2):
            g.add_edge(int(stubs_arr[i]), int(stubs_arr[i + 1]))
    # cross-community configuration model: re-draw a partner until it is
    # outside the node's community (bounded retries keeps it O(n))
    stubs = []
    for v in range(n):
        stubs.extend([v] * int(external[v]))
    stubs_arr = rng.permutation(np.array(stubs, dtype=np.int64))
    i, j = 0, len(stubs_arr) - 1
    for i in range(0, len(stubs_arr) - 1, 2):
        u, v = int(stubs_arr[i]), int(stubs_arr[i + 1])
        if comm_of[u] != comm_of[v]:
            g.add_edge(u, v)
        else:
            # one retry with a uniformly random other-community node
            cand = int(rng.integers(0, n))
            if comm_of[cand] != comm_of[u]:
                g.add_edge(u, cand)
    return g, comms
