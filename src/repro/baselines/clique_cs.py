"""Densest clique-percolation community search (Yuan et al. [62]).

The community is the k-clique percolation community containing the
query node for the *largest* feasible k: maximal cliques (Bron–Kerbosch)
of size >= k are adjacent when they share >= k-1 nodes; a community is
the union of a percolation-connected set of cliques. Exponential in the
worst case, so guarded by a node budget — the paper likewise reports
clique only on the small graphs (returns None over budget).
"""
from __future__ import annotations

from collections import deque
from typing import FrozenSet, Iterable, List, Optional, Set

from ..graphs.local import LocalGraph


def clique_cs(
    g: LocalGraph,
    queries: Iterable[int],
    max_nodes: int = 3000,
    max_cliques: int = 200_000,
) -> Optional[Set[int]]:
    qs = sorted(set(int(q) for q in queries))
    if not qs or any(q not in g for q in qs):
        return None
    comp = g.connected_component(qs[0])
    if any(q not in comp for q in qs):
        return None
    if len(comp) > max_nodes:
        return None  # over budget (paper: no result within time limit)
    sub = g.subgraph(comp)
    cliques: List[FrozenSet[int]] = []
    for c in sub.maximal_cliques():
        cliques.append(c)
        if len(cliques) > max_cliques:
            return None
    k_hi = max((len(c) for c in cliques if all(q in c for q in [qs[0]])), default=0)
    k_hi = max(k_hi, max((len(c) for c in cliques), default=0))
    for k in range(k_hi, 1, -1):
        ks = [c for c in cliques if len(c) >= k]
        seeds = [i for i, c in enumerate(ks) if any(q in c for q in qs)]
        if not seeds:
            continue
        # percolation BFS over cliques sharing >= k-1 nodes
        seen = {seeds[0]}
        dq = deque([seeds[0]])
        while dq:
            i = dq.popleft()
            for j in range(len(ks)):
                if j not in seen and len(ks[i] & ks[j]) >= k - 1:
                    seen.add(j)
                    dq.append(j)
        members: Set[int] = set()
        for i in seen:
            members |= ks[i]
        if all(q in members for q in qs):
            return members
    return None
