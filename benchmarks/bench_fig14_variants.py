"""Figure 14 bench — the four (removable-node, scorer) combinations.
NCA variants run on a 300-node LFR slice (their per-removal Tarjan pass
dominates; the relative ordering NCA > NCA-DR > FPA-DMG > FPA in cost is
what Figure 14 reports)."""
import pytest

from repro.core import fpa, nca, nca_dr
from repro.evaluation.datasets import lfr
from repro.evaluation.queries import query_sets


@pytest.fixture(scope="module")
def lfr300():
    g, comms = lfr(seed=14, n=300, d_avg=12, d_max=30, max_c=60)
    q = query_sets(g, comms, n_sets=1, seed=5)[0]
    return g, q


def test_bench_nca(benchmark, lfr300):
    g, q = lfr300
    r = benchmark(lambda: nca(g, q))
    assert r


def test_bench_nca_dr(benchmark, lfr300):
    g, q = lfr300
    r = benchmark(lambda: nca_dr(g, q))
    assert r


def test_bench_fpa_dmg(benchmark, lfr300):
    g, q = lfr300
    r = benchmark(lambda: fpa(g, q, scorer="dmg", prune=False))
    assert r


def test_bench_fpa_ratio(benchmark, lfr300):
    g, q = lfr300
    r = benchmark(lambda: fpa(g, q, prune=False))
    assert r
