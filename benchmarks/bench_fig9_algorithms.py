"""Figure 9 bench — per-algorithm running time on the default LFR graph
(single query; the harness jobs measure the full sweeps)."""
import pytest

from repro.baselines import highcore, hightruss, huang2015, icwi2008, kc, kecc_cs, kt, wu2015
from repro.core import fpa
from repro.graphs.localops import core_numbers, truss_numbers


@pytest.fixture(scope="module")
def indices(lfr_default):
    g, _ = lfr_default
    return core_numbers(g), truss_numbers(g)


def bench_case(benchmark, fn):
    res = benchmark(fn)
    assert res is None or len(res) >= 1


def test_bench_fpa(benchmark, lfr_default, lfr_query):
    g, _ = lfr_default
    bench_case(benchmark, lambda: fpa(g, lfr_query))


def test_bench_kc(benchmark, lfr_default, lfr_query, indices):
    g, _ = lfr_default
    cores, _ = indices
    bench_case(benchmark, lambda: kc(g, lfr_query, k=3, cores=cores))


def test_bench_kt(benchmark, lfr_default, lfr_query, indices):
    g, _ = lfr_default
    _, truss = indices
    bench_case(benchmark, lambda: kt(g, lfr_query, k=4, truss=truss))


def test_bench_kecc(benchmark, lfr_default, lfr_query):
    g, _ = lfr_default
    bench_case(benchmark, lambda: kecc_cs(g, lfr_query, k=3, exact_limit=0))


def test_bench_highcore(benchmark, lfr_default, lfr_query, indices):
    g, _ = lfr_default
    cores, _ = indices
    bench_case(benchmark, lambda: highcore(g, lfr_query, cores=cores))


def test_bench_hightruss(benchmark, lfr_default, lfr_query, indices):
    g, _ = lfr_default
    _, truss = indices
    bench_case(benchmark, lambda: hightruss(g, lfr_query, truss=truss))


def test_bench_huang2015(benchmark, lfr_default, lfr_query, indices):
    g, _ = lfr_default
    _, truss = indices
    bench_case(benchmark, lambda: huang2015(g, lfr_query, truss=truss))


def test_bench_wu2015(benchmark, lfr_default, lfr_query):
    g, _ = lfr_default
    bench_case(benchmark, lambda: wu2015(g, lfr_query))


def test_bench_icwi2008(benchmark, lfr_default, lfr_query):
    g, _ = lfr_default
    bench_case(benchmark, lambda: icwi2008(g, lfr_query))
