"""Figure 19 bench — parameterized baselines at two k values on
DBLP-lite (index precomputed, as in the harness)."""
import pytest

from repro.baselines import kc, kt
from repro.evaluation.queries import query_sets
from repro.graphs.localops import core_numbers, truss_numbers


@pytest.fixture(scope="module")
def prepared(dblp_lite):
    g, comms = dblp_lite
    q = query_sets(g, comms, n_sets=1, seed=8)[0]
    return g, q, core_numbers(g), truss_numbers(g)


@pytest.mark.parametrize("k", [3, 5])
def test_bench_kc_k(benchmark, prepared, k):
    g, q, cores, _ = prepared
    benchmark(lambda: kc(g, q, k=k, cores=cores))


@pytest.mark.parametrize("k", [4, 6])
def test_bench_kt_k(benchmark, prepared, k):
    g, q, _, truss = prepared
    benchmark(lambda: kt(g, q, k=k, truss=truss))
