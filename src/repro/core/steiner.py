"""Multi-query connector (paper §5.6).

FPA needs the query set replaced by one connected seed so that peeling
farthest layers can never disconnect a query node from the rest. The
paper's simple Steiner-style procedure: pick one query node, BFS to all
others, union the shortest paths. Returned node set contains Q and
induces a connected subgraph.
"""
from __future__ import annotations

from collections import deque
from typing import Dict, Iterable, List, Set

from ..graphs.local import LocalGraph


def steiner_connector(g: LocalGraph, queries: Iterable[int]) -> Set[int]:
    qs: List[int] = sorted(set(int(q) for q in queries))
    if not qs:
        raise ValueError("need at least one query node")
    for q in qs:
        if q not in g:
            raise KeyError(f"query node {q} not in graph")
    if len(qs) == 1:
        return {qs[0]}
    root = qs[0]
    parent: Dict[int, int] = {root: root}
    dq: deque[int] = deque([root])
    remaining = set(qs[1:])
    while dq and remaining:
        v = dq.popleft()
        for u in g.adj[v]:
            if u not in parent:
                parent[u] = v
                remaining.discard(u)
                dq.append(u)
    unreachable = [q for q in qs[1:] if q not in parent]
    if unreachable:
        raise ValueError(f"query nodes not connected to {root}: {unreachable}")
    out: Set[int] = {root}
    for q in qs[1:]:
        v = q
        while v != root:
            out.add(v)
            v = parent[v]
    return out
