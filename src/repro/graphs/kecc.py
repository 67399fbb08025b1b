"""k-edge-connected components (baseline substrate for Chang et al. [10]).

Exact algorithm (small graphs): recursive global min-cut partitioning —
if a connected subgraph's Stoer–Wagner min cut >= k it is a k-ECC,
otherwise split along the cut and recurse. Exactness costs O(|V|³) per
level, so above ``exact_limit`` nodes we fall back to the standard
superset certificate: iterate (restrict to k-core → remove bridges) to a
fixpoint, then take connected components. The heuristic can only
*over*-approximate a k-ECC (return a superset), which biases the kecc
baseline toward the paper's reported behaviour of returning large,
low-precision communities (DESIGN.md §6).
"""
from __future__ import annotations

from typing import List, Set

from .local import LocalGraph


def kecc_exact(g: LocalGraph, k: int) -> List[Set[int]]:
    """Exact k-edge-connected components via recursive min cut."""
    out: List[Set[int]] = []
    stack = [c for c in g.connected_components()]
    while stack:
        comp = stack.pop()
        if len(comp) == 1:
            out.append(comp)
            continue
        sub = g.subgraph(comp)
        cut, side = sub.stoer_wagner()
        if cut >= k:
            out.append(comp)
            continue
        other = comp - side
        for part in (side, other):
            sg = sub.subgraph(part)
            stack.extend(sg.connected_components())
    return out


def kecc_superset(g: LocalGraph, k: int) -> List[Set[int]]:
    """Superset heuristic: (k-core ∘ bridge removal)* then components."""
    h = g.copy()
    changed = True
    while changed and h.n:
        changed = False
        # k-core restriction (k-edge-connected ⊆ k-core)
        while True:
            weak = [v for v in h.adj if len(h.adj[v]) < k]
            if not weak:
                break
            for v in weak:
                h.remove_node(v)
            changed = True
        if not h.n:
            break
        br = h.bridges()
        if br and k >= 2:
            for u, v in br:
                h.remove_edge(u, v)
            changed = True
    return [c for c in h.connected_components()]


def kecc(g: LocalGraph, k: int, exact_limit: int = 400) -> List[Set[int]]:
    """k-ECCs; exact below ``exact_limit`` nodes, superset heuristic above."""
    if g.n <= exact_limit:
        return kecc_exact(g, k)
    return kecc_superset(g, k)
