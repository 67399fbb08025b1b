"""Classic and analog graphs with ground-truth communities.

* Zachary's karate club — the exact public 34-node / 78-edge graph with
  its real two-faction split (used by the paper for Figure 5/15).
* Ring of cliques — Figure 2's resolution-limit construction.
* Planted-partition and degree-corrected two-block analogs standing in
  for Dolphin / Mexican / Polblogs (DESIGN.md §5: no network access, so
  we match |V|, |E|, |C| and the degree profile rather than downloading).
* ``overlapping_communities`` — "DBLP/Youtube-lite" generators with many
  small, optionally overlapping ground-truth communities (Figures 17/18).

Every generator returns ``(LocalGraph, communities)`` where communities
is a list of node-id sets (ground truth).
"""
from __future__ import annotations

import itertools
from typing import Dict, List, Sequence, Set, Tuple

import numpy as np

from ..graphs.local import LocalGraph

# Canonical Zachary karate edge list (0-indexed, u < v).
KARATE_EDGES: Tuple[Tuple[int, int], ...] = (
    (0, 1), (0, 2), (0, 3), (0, 4), (0, 5), (0, 6), (0, 7), (0, 8), (0, 10),
    (0, 11), (0, 12), (0, 13), (0, 17), (0, 19), (0, 21), (0, 31), (1, 2),
    (1, 3), (1, 7), (1, 13), (1, 17), (1, 19), (1, 21), (1, 30), (2, 3),
    (2, 7), (2, 8), (2, 9), (2, 13), (2, 27), (2, 28), (2, 32), (3, 7),
    (3, 12), (3, 13), (4, 6), (4, 10), (5, 6), (5, 10), (5, 16), (6, 16),
    (8, 30), (8, 32), (8, 33), (9, 33), (13, 33), (14, 32), (14, 33),
    (15, 32), (15, 33), (18, 32), (18, 33), (19, 33), (20, 32), (20, 33),
    (22, 32), (22, 33), (23, 25), (23, 27), (23, 29), (23, 32), (23, 33),
    (24, 25), (24, 27), (24, 31), (25, 31), (26, 29), (26, 33), (27, 33),
    (28, 31), (28, 33), (29, 32), (29, 33), (30, 32), (30, 33), (31, 32),
    (31, 33), (32, 33),
)

# Real faction split ("Mr. Hi" vs "Officer") from Zachary [63].
KARATE_MR_HI: frozenset = frozenset(
    {0, 1, 2, 3, 4, 5, 6, 7, 8, 10, 11, 12, 13, 16, 17, 19, 21}
)


def karate() -> Tuple[LocalGraph, List[Set[int]]]:
    g = LocalGraph.from_edges(KARATE_EDGES)
    officer = set(range(34)) - set(KARATE_MR_HI)
    return g, [set(KARATE_MR_HI), officer]


def ring_of_cliques(
    n_cliques: int = 30, clique_size: int = 6
) -> Tuple[LocalGraph, List[Set[int]]]:
    """Figure 2: cliques arranged in a ring, one bridging edge between
    consecutive cliques. Each clique is a ground-truth community."""
    g = LocalGraph()
    comms: List[Set[int]] = []
    for c in range(n_cliques):
        base = c * clique_size
        nodes = list(range(base, base + clique_size))
        for u, v in itertools.combinations(nodes, 2):
            g.add_edge(u, v)
        comms.append(set(nodes))
    for c in range(n_cliques):
        # last node of clique c to first node of clique c+1
        u = c * clique_size + clique_size - 1
        v = ((c + 1) % n_cliques) * clique_size
        g.add_edge(u, v)
    return g, comms


def planted_partition(
    sizes: Sequence[int],
    p_in: float,
    p_out: float,
    seed: int = 0,
) -> Tuple[LocalGraph, List[Set[int]]]:
    """Stochastic block model with constant intra/inter edge probability."""
    rng = np.random.default_rng(seed)
    offsets = np.cumsum([0] + list(sizes))
    n = offsets[-1]
    comms = [set(range(offsets[i], offsets[i + 1])) for i in range(len(sizes))]
    block = np.zeros(n, dtype=np.int64)
    for i, c in enumerate(comms):
        for v in c:
            block[v] = i
    g = LocalGraph()
    for v in range(n):
        g.add_node(v)
    iu, iv = np.triu_indices(n, k=1)
    same = block[iu] == block[iv]
    p = np.where(same, p_in, p_out)
    take = rng.random(len(iu)) < p
    for u, v in zip(iu[take].tolist(), iv[take].tolist()):
        g.add_edge(u, v)
    return g, comms


def _match_edges(sizes, target_edges, frac_in, seed):
    """Planted partition calibrated to hit ~target_edges total."""
    n = sum(sizes)
    pairs_in = sum(s * (s - 1) // 2 for s in sizes)
    pairs_out = n * (n - 1) // 2 - pairs_in
    e_in = target_edges * frac_in
    e_out = target_edges - e_in
    p_in = min(1.0, e_in / max(1, pairs_in))
    p_out = min(1.0, e_out / max(1, pairs_out))
    return planted_partition(sizes, p_in, p_out, seed=seed)


def dolphin_analog(seed: int = 7) -> Tuple[LocalGraph, List[Set[int]]]:
    """Two-block analog of the Doubtful Sound dolphin network: |V|=62,
    |E|≈159, blocks 41/21 (the real male/female split sizes)."""
    return _match_edges([41, 21], 159, frac_in=0.92, seed=seed)


def mexican_analog(seed: int = 8) -> Tuple[LocalGraph, List[Set[int]]]:
    """Two-block analog of the Mexican politician network: |V|=35,
    |E|≈117, civil/military blocks 20/15."""
    return _match_edges([20, 15], 117, frac_in=0.85, seed=seed)


def polblogs_analog(seed: int = 9) -> Tuple[LocalGraph, List[Set[int]]]:
    """Degree-corrected two-block analog of Polblogs: |V|=1224,
    |E|≈16718, blocks 586/638, power-law expected degrees (the real
    network's hub structure is what makes it hard for core/truss
    baselines)."""
    rng = np.random.default_rng(seed)
    sizes = [586, 638]
    n = sum(sizes)
    comms = [set(range(sizes[0])), set(range(sizes[0], n))]
    block = np.array([0] * sizes[0] + [1] * sizes[1])
    # power-law weights, Chung-Lu style degree correction
    w = (1.0 - rng.random(n)) ** (-1.0 / 1.5)  # pareto-ish, alpha≈2.5
    w = np.clip(w, 1.0, 60.0)
    target_e, frac_in = 16718, 0.91
    g = LocalGraph()
    for v in range(n):
        g.add_node(v)
    iu, iv = np.triu_indices(n, k=1)
    same = block[iu] == block[iv]
    raw = w[iu] * w[iv]
    pin = raw * same
    pout = raw * (~same)
    pin = pin / pin.sum() * (target_e * frac_in)
    pout = pout / pout.sum() * (target_e * (1 - frac_in))
    p = np.clip(pin + pout, 0.0, 1.0)
    take = rng.random(len(iu)) < p
    for u, v in zip(iu[take].tolist(), iv[take].tolist()):
        g.add_edge(u, v)
    return g, comms


def overlapping_communities(
    n_communities: int = 60,
    size_lo: int = 8,
    size_hi: int = 40,
    p_in: float = 0.5,
    overlap_frac: float = 0.15,
    background_edges_per_node: float = 1.0,
    seed: int = 11,
) -> Tuple[LocalGraph, List[Set[int]]]:
    """DBLP/Youtube-lite: many small ground-truth communities, a fraction
    of nodes belonging to two communities, plus sparse background edges.

    Mirrors the properties Figures 17/18 depend on: small overlapping
    ground-truth communities embedded in a much larger sparse graph.
    """
    rng = np.random.default_rng(seed)
    comms: List[Set[int]] = []
    next_id = 0
    all_nodes: List[int] = []
    for _ in range(n_communities):
        size = int(rng.integers(size_lo, size_hi + 1))
        members: Set[int] = set()
        n_overlap = int(size * overlap_frac)
        if all_nodes and n_overlap:
            members |= set(
                rng.choice(all_nodes, size=min(n_overlap, len(all_nodes)), replace=False).tolist()
            )
        while len(members) < size:
            members.add(next_id)
            next_id += 1
        comms.append(members)
        all_nodes = list(set(all_nodes) | members)
    g = LocalGraph()
    for v in all_nodes:
        g.add_node(v)
    for c in comms:
        cl = sorted(c)
        for u, v in itertools.combinations(cl, 2):
            if rng.random() < p_in:
                g.add_edge(u, v)
    # sparse background to make the graph connected-ish and noisy
    n_bg = int(len(all_nodes) * background_edges_per_node)
    nodes_arr = np.array(all_nodes)
    for _ in range(n_bg):
        u, v = rng.choice(nodes_arr, size=2, replace=False).tolist()
        g.add_edge(int(u), int(v))
    return g, comms
