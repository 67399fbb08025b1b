"""Distributed substrate benchmarks: the Spark DataFrame passes behind
the algorithms (BFS layers, connected components, k-core, triangle
support) on the default LFR graph lifted into the distributed Graph."""
import pytest

from repro.graphs import bfs, components, kcore, triangles
from repro.graphs.graph import Graph


@pytest.fixture(scope="module")
def spark_lfr(spark, lfr_default):
    g, _ = lfr_default
    G = Graph.from_local(spark, g)
    G.edges.count()  # materialize the cache
    return G


def test_bench_spark_degrees(benchmark, spark_lfr):
    benchmark(lambda: spark_lfr.degrees().count())


def test_bench_spark_bfs(benchmark, spark_lfr, lfr_query):
    benchmark(lambda: bfs.distances(spark_lfr, lfr_query).count())


def test_bench_spark_components(benchmark, spark_lfr):
    benchmark(lambda: components.connected_components(spark_lfr).count())


def test_bench_spark_kcore(benchmark, spark_lfr):
    benchmark(lambda: kcore.k_core(spark_lfr, 3).num_edges)


def test_bench_spark_triangles(benchmark, spark_lfr):
    benchmark(lambda: triangles.edge_support(spark_lfr).count())
