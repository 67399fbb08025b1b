"""Figure 10 bench — FPA cost as the query set grows (multi-query
Steiner connector + layered peel)."""
import pytest

from repro.core import fpa
from repro.evaluation.queries import query_sets


@pytest.mark.parametrize("qsize", [1, 4, 16])
def test_bench_fpa_multiquery(benchmark, lfr_default, qsize):
    g, comms = lfr_default
    q = query_sets(g, comms, n_sets=1, q_size=qsize, seed=qsize)[0]
    r = benchmark(lambda: fpa(g, q))
    assert r and set(q) <= r
