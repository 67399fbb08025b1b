"""Fast Peeling Algorithm (paper §5.5-§5.7, Algorithm 2).

Removable nodes = current farthest BFS layer from the query seed (safe:
every surviving node keeps a shortest path through strictly lower
layers, so removing any subset of the farthest layer cannot disconnect
the rest). Best node = max density ratio Θ (stable: only neighbours of a
removed node need updates — maintained with a lazy-deletion heap).

Variants:
* ``scorer="dmg"``  → FPA-DMG (Figure 14): density-modularity gain Λ,
  unstable, recomputed over the whole candidate layer each removal.
* ``measure``       → which goodness function picks the incumbent
  ("dm" | "cm" | "gmd", Figure 12).
* ``prune=True``    → §5.7 layer-based pruning: score the distance-prefix
  subgraphs coarsely, jump to the best prefix, then peel inward from its
  outermost layer. Off by default: the paper's own §6.2.4 reports pruned
  FPA as less effective, and its headline Figure 8 accuracy is only
  consistent with the un-pruned variant; Figure 13 is reproduced by
  jobs/e13_pruning.py with both settings.
"""
from __future__ import annotations

import heapq
from typing import Dict, FrozenSet, Iterable, List, Optional, Set

from ..graphs.local import LocalGraph
from .modularity import density_ratio, dm_gain
from .peel import PeelState
from .steiner import steiner_connector


def _layers_from(dist: Dict[int, int]) -> List[List[int]]:
    layers: List[List[int]] = [[] for _ in range(max(dist.values()) + 1)]
    for v, d in dist.items():
        layers[d].append(v)
    return layers


def _peel_layer_ratio(state: PeelState, layer: List[int], measure: str,
                      best: FrozenSet[int], best_score: float):
    """Drain one layer in max-Θ order with a lazy-deletion heap."""
    heap = [(-density_ratio(state.deg[v], state.k[v]), state.k[v], v) for v in layer]
    heapq.heapify(heap)
    cand = set(layer)
    while cand:
        negt, kv, u = heapq.heappop(heap)
        if u not in cand or state.k[u] != kv:
            continue  # stale entry
        cand.discard(u)
        changed = state.remove(u)
        for w in changed:
            if w in cand:
                heapq.heappush(
                    heap, (-density_ratio(state.deg[w], state.k[w]), state.k[w], w)
                )
        s = state.score(measure)
        if s >= best_score:
            best_score, best = s, frozenset(state.S)
    return best, best_score


def _peel_layer_dmg(state: PeelState, layer: List[int], measure: str,
                    best: FrozenSet[int], best_score: float):
    """Drain one layer in max-Λ order; Λ is unstable (Lemma 4) so it is
    recomputed over all remaining candidates each removal."""
    cand = set(layer)
    while cand:
        u = max(cand, key=lambda v: (dm_gain(state.k[v], state.d, state.deg[v], state.m), v))
        cand.discard(u)
        state.remove(u)
        s = state.score(measure)
        if s >= best_score:
            best_score, best = s, frozenset(state.S)
    return best, best_score


def fpa(
    g: LocalGraph,
    queries: Iterable[int],
    *,
    prune: bool = False,
    scorer: str = "ratio",
    measure: str = "dm",
) -> Optional[Set[int]]:
    """Run FPA; returns the community node set, or None when the query
    nodes are not in one connected component."""
    qs = sorted(set(int(q) for q in queries))
    if not qs or any(q not in g for q in qs):
        return None
    comp = g.connected_component(qs[0])
    if any(q not in comp for q in qs):
        return None
    seed = steiner_connector(g, qs)  # connected ⊇ Q (singleton {q} if |Q|=1)
    dist = g.bfs_dist(seed)
    dist = {v: d for v, d in dist.items() if v in comp}
    state = PeelState(g, comp)
    best: FrozenSet[int] = frozenset(comp)
    best_score = state.score(measure)
    if max(dist.values()) == 0:
        return set(best)
    layers = _layers_from(dist)
    peel = _peel_layer_ratio if scorer == "ratio" else _peel_layer_dmg

    if prune:
        # §5.7 — score each distance-prefix S_i = {v : dist(v) <= i} by
        # bulk-removing whole layers (cheap, O(|V|) total), jump to the
        # best prefix, then run the fine-grained peel inward from that
        # prefix's outermost layer. The speedup comes from never peeling
        # the distant layers node-by-node; the search space shrinks to
        # the chosen prefix, which is why the paper reports slightly
        # lower effectiveness than un-pruned FPA (Figure 13).
        prefix_state = PeelState(g, comp)
        scores = {len(layers) - 1: prefix_state.score(measure)}
        for i in range(len(layers) - 1, 0, -1):
            for v in layers[i]:
                prefix_state.remove(v)
            scores[i - 1] = prefix_state.score(measure)
        i_star = max(scores, key=lambda i: (scores[i], -i))
        keep = set().union(*(layers[: i_star + 1]))
        state = PeelState(g, keep)
        best, best_score = frozenset(keep), state.score(measure)
        for i in range(i_star, 0, -1):
            best, best_score = peel(state, list(layers[i]), measure, best, best_score)
        return set(best)

    for i in range(len(layers) - 1, 0, -1):
        best, best_score = peel(state, list(layers[i]), measure, best, best_score)
    return set(best)


def fpa_no_prune(g: LocalGraph, queries: Iterable[int], **kw) -> Optional[Set[int]]:
    """FPA without the §5.7 pruning strategy (Figure 13 comparison)."""
    return fpa(g, queries, prune=False, **kw)
