"""Figure 17/18 bench — FPA and kc on the DBLP-lite overlapping-community
analog (the large-graph regime of the paper)."""
from repro.baselines import kc
from repro.core import fpa
from repro.evaluation.queries import query_sets
from repro.graphs.localops import core_numbers


def test_bench_fpa_dblp(benchmark, dblp_lite):
    g, comms = dblp_lite
    q = query_sets(g, comms, n_sets=1, seed=7)[0]
    r = benchmark(lambda: fpa(g, q))
    assert r


def test_bench_kc_dblp(benchmark, dblp_lite):
    g, comms = dblp_lite
    q = query_sets(g, comms, n_sets=1, seed=7)[0]
    cores = core_numbers(g)
    benchmark(lambda: kc(g, q, k=3, cores=cores))
