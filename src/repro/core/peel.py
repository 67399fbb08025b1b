"""Incremental peel state shared by NCA and FPA (framework Algorithm 1).

Tracks the current community ``S`` and the scalar statistics needed by
every measure — internal edge count ``l_S``, original-degree sum
``d_S``, and per-node internal-edge counts ``k_{v,S}`` — updated in
O(deg(v)) per removal. The full graph is never mutated; degrees ``d_v``
are original-graph degrees throughout, matching the null model in
Definitions 1/2/5/6.
"""
from __future__ import annotations

from typing import Dict, Iterable, List, Set

from ..graphs.local import LocalGraph
from .modularity import (
    classic_modularity,
    density_modularity,
    generalized_modularity_density,
)

MEASURES = ("dm", "cm", "gmd")


class PeelState:
    __slots__ = ("g", "m", "deg", "S", "k", "l", "d")

    def __init__(
        self,
        g_full: LocalGraph,
        nodes: Iterable[int],
        degrees: Dict[int, int] | None = None,
    ) -> None:
        self.g = g_full
        self.m = g_full.m
        self.deg = degrees if degrees is not None else g_full.degrees()
        self.S: Set[int] = set(nodes)
        self.k: Dict[int, int] = {
            v: sum(1 for u in g_full.adj[v] if u in self.S) for v in self.S
        }
        self.l: int = sum(self.k.values()) // 2
        self.d: int = sum(self.deg[v] for v in self.S)

    def remove(self, v: int) -> List[int]:
        """Remove ``v`` from S; returns the members whose k changed."""
        self.S.remove(v)
        self.l -= self.k.pop(v)
        self.d -= self.deg[v]
        changed: List[int] = []
        for u in self.g.adj[v]:
            if u in self.S:
                self.k[u] -= 1
                changed.append(u)
        return changed

    # ------------------------------------------------------------- scoring
    def dm(self) -> float:
        return density_modularity(self.l, self.d, len(self.S), self.m)

    def cm(self) -> float:
        return classic_modularity(self.l, self.d, self.m)

    def gmd(self) -> float:
        return generalized_modularity_density(self.l, self.d, len(self.S), self.m)

    def score(self, measure: str = "dm") -> float:
        if measure == "dm":
            return self.dm()
        if measure == "cm":
            return self.cm()
        if measure == "gmd":
            return self.gmd()
        raise ValueError(f"unknown measure {measure!r}; expected one of {MEASURES}")
