"""Shared test helpers: random graphs, networkx bridging."""
from __future__ import annotations

from typing import List, Set, Tuple

import networkx as nx
import numpy as np
import pandas as pd

from repro.graphs.local import LocalGraph

# (n, p, seed) triples used across parametrized reference tests
GNP_CASES: List[Tuple[int, float, int]] = [
    (12, 0.25, 1),
    (20, 0.2, 2),
    (30, 0.15, 3),
    (40, 0.1, 4),
    (25, 0.3, 5),
    (35, 0.12, 6),
    (18, 0.4, 7),
    (50, 0.08, 8),
]


def random_local_graph(n: int, p: float, seed: int) -> LocalGraph:
    rng = np.random.default_rng(seed)
    g = LocalGraph()
    for v in range(n):
        g.add_node(v)
    iu, iv = np.triu_indices(n, k=1)
    take = rng.random(len(iu)) < p
    for u, v in zip(iu[take].tolist(), iv[take].tolist()):
        g.add_edge(u, v)
    return g


def to_nx(g: LocalGraph) -> nx.Graph:
    G = nx.Graph()
    G.add_nodes_from(g.nodes())
    G.add_edges_from(g.edges())
    return G


def edges_pdf(g: LocalGraph) -> pd.DataFrame:
    es = sorted(g.edges())
    if not es:
        return pd.DataFrame({"src": pd.Series(dtype="int64"), "dst": pd.Series(dtype="int64")})
    return pd.DataFrame(es, columns=["src", "dst"]).astype("int64")
