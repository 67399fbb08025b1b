"""Distributed k-truss: support-based edge peeling + truss decomposition.

A k-truss is the maximal subgraph whose every edge participates in at
least (k-2) triangles *within the subgraph*. ``k_truss`` iterates
(recompute support → drop weak edges) to fixpoint; ``truss_numbers``
sweeps k upward recording the last k each edge survived.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .graph import Graph
from .triangles import edge_support

_CHECKPOINT_EVERY = 1


def k_truss(graph: Graph, k: int) -> Graph:
    """Maximal subgraph where every edge has support >= k-2."""
    g = graph
    it = 0
    while True:
        it += 1
        sup = edge_support(g)
        strong = sup.where(F.col("support") >= k - 2).select("src", "dst")
        strong = (
            strong.localCheckpoint(eager=True)
            if it % _CHECKPOINT_EVERY == 0
            else strong.cache()
        )
        before = g.num_edges
        after = strong.count()
        g = Graph(graph.spark, strong, _canonical=True)
        g._num_edges = after
        if after == before or after == 0:
            return g


def truss_numbers(graph: Graph, max_k: int | None = None) -> DataFrame:
    """Truss number per canonical edge, columns (src, dst, truss).

    truss(e) = the largest k such that e belongs to the k-truss. Every
    edge has truss >= 2 by convention.
    """
    out = graph.edges.withColumn("truss", F.lit(2)).cache()
    g = graph
    k = 3
    while True:
        g = k_truss(g, k)
        if g.num_edges == 0:
            break
        out = (
            out.join(g.edges.withColumn("_s", F.lit(1)), ["src", "dst"], "left")
            .select(
                "src",
                "dst",
                F.when(F.col("_s").isNotNull(), F.lit(k)).otherwise(F.col("truss")).alias("truss"),
            )
            .localCheckpoint(eager=True)
        )
        if max_k is not None and k >= max_k:
            break
        k += 1
    return out


def node_truss_numbers(graph: Graph, max_k: int | None = None) -> DataFrame:
    """Max truss number over a node's incident edges, columns (id, truss)."""
    t = truss_numbers(graph, max_k=max_k)
    both = t.select(F.col("src").alias("id"), "truss").unionByName(
        t.select(F.col("dst").alias("id"), "truss")
    )
    return both.groupBy("id").agg(F.max("truss").alias("truss"))
