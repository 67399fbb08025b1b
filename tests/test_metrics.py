"""NMI / ARI / F1 metric implementations: golden values, identities,
and hypothesis properties."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.evaluation.metrics import (
    ari_binary,
    f1_binary,
    nmi_binary,
    score_against_best_truth,
)


class TestPerfectAndDisjoint:
    def test_perfect_match(self):
        found = {1, 2, 3}
        assert nmi_binary(10, found, found) == pytest.approx(1.0)
        assert ari_binary(10, found, found) == pytest.approx(1.0)
        assert f1_binary(10, found, found) == pytest.approx(1.0)

    def test_disjoint(self):
        assert f1_binary(10, {1, 2}, {3, 4}) == 0.0
        assert nmi_binary(10, {1, 2}, {3, 4}) == pytest.approx(0.0, abs=0.12)
        assert ari_binary(10, {1, 2}, {3, 4}) == 0.0  # clipped

    def test_whole_universe_found(self):
        # degenerate partition {V, ∅} carries no information
        universe = set(range(10))
        assert nmi_binary(10, universe, {1, 2}) == 0.0

    def test_empty_found(self):
        assert f1_binary(10, set(), {1, 2}) == 0.0


class TestGoldenValues:
    def test_f1_half_overlap(self):
        # P = 1/2, R = 1/2 → F1 = 1/2
        assert f1_binary(10, {1, 2}, {2, 3}) == pytest.approx(0.5)

    def test_f1_subset(self):
        # P = 1, R = 1/2 → F1 = 2/3
        assert f1_binary(10, {1}, {1, 2}) == pytest.approx(2 / 3)

    def test_ari_known_case(self):
        # n=6, C={a,b,c}, T={a,b,d}: n11=2,n10=1,n01=1,n00=2
        # index=2, sumA=sumB=6, exp=36/15=2.4, max=6 → (2-2.4)/3.6 <0 → 0
        assert ari_binary(6, {0, 1, 2}, {0, 1, 3}) == pytest.approx(0.0)

    def test_nmi_symmetric(self):
        a, b = {1, 2, 3}, {2, 3, 4, 5}
        assert nmi_binary(20, a, b) == pytest.approx(nmi_binary(20, b, a))

    def test_ari_symmetric(self):
        a, b = {1, 2, 3}, {2, 3, 4, 5}
        assert ari_binary(20, a, b) == pytest.approx(ari_binary(20, b, a))


@st.composite
def two_sets(draw):
    n = draw(st.integers(4, 40))
    a = draw(st.sets(st.integers(0, 39), max_size=n))
    b = draw(st.sets(st.integers(0, 39), max_size=n))
    universe = set(range(40))
    return 40, a & universe, b & universe


class TestProperties:
    @given(two_sets())
    @settings(max_examples=80, deadline=None)
    def test_ranges(self, case):
        n, a, b = case
        for fn in (nmi_binary, ari_binary, f1_binary):
            v = fn(n, a, b)
            assert 0.0 <= v <= 1.0

    @given(two_sets())
    @settings(max_examples=80, deadline=None)
    def test_symmetry(self, case):
        n, a, b = case
        assert nmi_binary(n, a, b) == pytest.approx(nmi_binary(n, b, a))
        assert ari_binary(n, a, b) == pytest.approx(ari_binary(n, b, a))
        assert f1_binary(n, a, b) == pytest.approx(f1_binary(n, b, a))

    @given(st.sets(st.integers(0, 30), min_size=1, max_size=20))
    @settings(max_examples=50, deadline=None)
    def test_self_match_is_one(self, s):
        n = 40
        assert nmi_binary(n, s, s) == pytest.approx(1.0)
        assert ari_binary(n, s, s) == pytest.approx(1.0)
        assert f1_binary(n, s, s) == pytest.approx(1.0)


class TestBestTruthSelection:
    def test_picks_containing_community(self):
        comms = [{0, 1, 2}, {5, 6, 7}]
        nmi, ari, f1 = score_against_best_truth(10, {0, 1, 2}, comms, [0])
        assert nmi == pytest.approx(1.0) and f1 == pytest.approx(1.0)

    def test_overlapping_takes_best(self):
        comms = [{0, 1, 2, 3, 4, 5}, {0, 1, 2}]
        nmi, _, f1 = score_against_best_truth(10, {0, 1, 2}, comms, [0])
        assert f1 == pytest.approx(1.0)  # the small community matches exactly

    def test_query_not_in_any_truth(self):
        comms = [{5, 6}]
        assert score_against_best_truth(10, {0, 1}, comms, [0]) == (0.0, 0.0, 0.0)

    def test_empty_found(self):
        comms = [{0, 1}]
        assert score_against_best_truth(10, set(), comms, [0]) == (0.0, 0.0, 0.0)
