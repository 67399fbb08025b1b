"""Figure 12 bench — FPA cost under each incumbent-selection measure."""
import pytest

from repro.core import fpa


@pytest.mark.parametrize("measure", ["dm", "cm", "gmd"])
def test_bench_fpa_measure(benchmark, lfr_default, lfr_query, measure):
    g, _ = lfr_default
    r = benchmark(lambda: fpa(g, lfr_query, prune=False, measure=measure))
    assert r
