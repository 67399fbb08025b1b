"""Figure 8 bench — one end-to-end effectiveness evaluation (FPA on the
default LFR instance incl. metric scoring), the unit of work behind
every cell of the Figure 8 table."""
from repro.core import fpa
from repro.evaluation.metrics import score_against_best_truth


def test_bench_fpa_with_scoring(benchmark, lfr_default, lfr_query):
    g, comms = lfr_default

    def unit():
        found = fpa(g, lfr_query)
        return score_against_best_truth(g.n, found, comms, lfr_query)

    nmi, ari, f1 = benchmark(unit)
    assert 0 <= nmi <= 1


def test_bench_fpa_mu02(benchmark):
    from repro.evaluation.datasets import lfr
    from repro.evaluation.queries import query_sets

    g, comms = lfr(seed=100, mu=0.2)
    q = query_sets(g, comms, n_sets=1, seed=1)[0]
    r = benchmark(lambda: fpa(g, q))
    assert r
