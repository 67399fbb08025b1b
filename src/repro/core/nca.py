"""Non-articulation Cancellation Algorithm (paper §5.4).

Removable nodes = non-articulation, non-query nodes of the current
subgraph (recomputed each iteration via Tarjan DFS-tree — the paper's
stated bottleneck, O(|V|+|E|) per removal). Best node = max density
modularity gain Λ; ties removed farthest-first ("keep the node that is
closely located to the query nodes").

``scorer="ratio"`` gives the NCA-DR variant ((a)+(d), Figure 14).
``time_budget`` (seconds) makes the harness's timeout explicit: on
expiry the best incumbent found so far is returned and
``nca.timed_out`` is set on the wrapper result via the harness.
"""
from __future__ import annotations

import time
from typing import Dict, FrozenSet, Iterable, Optional, Set

from ..graphs.local import LocalGraph
from .modularity import density_ratio, dm_gain
from .peel import PeelState


def nca(
    g: LocalGraph,
    queries: Iterable[int],
    *,
    scorer: str = "dmg",
    measure: str = "dm",
    time_budget: float | None = None,
) -> Optional[Set[int]]:
    qs = sorted(set(int(q) for q in queries))
    if not qs or any(q not in g for q in qs):
        return None
    comp = g.connected_component(qs[0])
    if any(q not in comp for q in qs):
        return None
    dist = g.bfs_dist(qs)
    work = g.subgraph(comp)  # mutable working copy of the candidate subgraph
    state = PeelState(g, comp)
    qset = set(qs)
    best: FrozenSet[int] = frozenset(comp)
    best_score = state.score(measure)
    t0 = time.monotonic()
    while True:
        if time_budget is not None and time.monotonic() - t0 > time_budget:
            break
        arts = work.articulation_points()
        cand = [v for v in state.S if v not in arts and v not in qset]
        if not cand:
            break
        if scorer == "dmg":
            u = max(
                cand,
                key=lambda v: (
                    dm_gain(state.k[v], state.d, state.deg[v], state.m),
                    dist.get(v, 0),
                    v,
                ),
            )
        else:  # NCA-DR
            u = max(
                cand,
                key=lambda v: (
                    density_ratio(state.deg[v], state.k[v]),
                    dist.get(v, 0),
                    v,
                ),
            )
        state.remove(u)
        work.remove_node(u)
        s = state.score(measure)
        if s >= best_score:
            best_score, best = s, frozenset(state.S)
    return set(best)


def nca_dr(g: LocalGraph, queries: Iterable[int], **kw) -> Optional[Set[int]]:
    """NCA with the density-ratio scorer ((a)+(d) in Figure 3/14)."""
    return nca(g, queries, scorer="ratio", **kw)
