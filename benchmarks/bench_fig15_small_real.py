"""Figure 15/16 bench — the full query unit on Karate: NCA, FPA, and the
slowest baselines (GN, clique) at the scale the paper reports them."""
from repro.baselines import clique_cs, gn
from repro.core import fpa, nca


def test_bench_fpa_karate(benchmark, karate_graph):
    g, _ = karate_graph
    r = benchmark(lambda: fpa(g, [33]))
    assert 33 in r


def test_bench_nca_karate(benchmark, karate_graph):
    g, _ = karate_graph
    r = benchmark(lambda: nca(g, [33]))
    assert 33 in r


def test_bench_gn_karate(benchmark, karate_graph):
    g, _ = karate_graph
    r = benchmark(lambda: gn(g, [33]))
    assert 33 in r


def test_bench_clique_karate(benchmark, karate_graph):
    g, _ = karate_graph
    r = benchmark(lambda: clique_cs(g, [33]))
    assert 33 in r
