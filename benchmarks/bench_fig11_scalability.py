"""Figure 11 bench — FPA and kc runtime at two graph scales (the full
sweep lives in jobs/e11_scalability.py)."""
import pytest

from repro.baselines import kc
from repro.core import fpa
from repro.evaluation.datasets import lfr
from repro.evaluation.queries import query_sets
from repro.graphs.localops import core_numbers


@pytest.fixture(scope="module", params=[2000, 5000])
def sized(request):
    n = request.param
    g, comms = lfr(seed=7, n=n, d_avg=12, d_max=60, max_c=min(200, n // 5))
    q = query_sets(g, comms, n_sets=1, seed=3)[0]
    return n, g, comms, q


def test_bench_fpa_scaling(benchmark, sized):
    n, g, comms, q = sized
    r = benchmark(lambda: fpa(g, q))
    assert r


def test_bench_kc_scaling(benchmark, sized):
    n, g, comms, q = sized
    cores = core_numbers(g)
    benchmark(lambda: kc(g, q, k=3, cores=cores))
