"""Graph generators: exact classics, calibrated analogs, LFR-lite."""
import numpy as np
import pytest

from repro.gendata.classic import (
    KARATE_EDGES,
    dolphin_analog,
    karate,
    mexican_analog,
    overlapping_communities,
    polblogs_analog,
    ring_of_cliques,
)
from repro.gendata.lfr import lfr_graph


class TestKarate:
    def test_exact_counts(self):
        g, comms = karate()
        assert g.n == 34 and g.m == 78
        assert len(KARATE_EDGES) == 78

    def test_two_factions_partition(self):
        g, comms = karate()
        assert len(comms) == 2
        assert comms[0] | comms[1] == set(range(34))
        assert not comms[0] & comms[1]

    def test_faction_sizes(self):
        _, comms = karate()
        assert sorted(map(len, comms)) == [17, 17]


class TestRingOfCliques:
    def test_paper_figure2_stats(self):
        g, comms = ring_of_cliques(30, 6)
        assert g.n == 180
        assert g.m == 30 * 15 + 30  # clique edges + ring bridges
        assert len(comms) == 30

    def test_cliques_are_cliques(self):
        g, comms = ring_of_cliques(5, 4)
        for c in comms:
            assert g.internal_edges(c) == 6  # C(4,2)

    def test_connected(self):
        g, _ = ring_of_cliques(4, 3)
        assert g.is_connected()


class TestAnalogs:
    def test_dolphin_stats(self):
        g, comms = dolphin_analog()
        assert g.n == 62 and len(comms) == 2
        assert abs(g.m - 159) <= 30  # stochastic target

    def test_mexican_stats(self):
        g, comms = mexican_analog()
        assert g.n == 35 and len(comms) == 2
        assert abs(g.m - 117) <= 25

    def test_polblogs_stats(self):
        g, comms = polblogs_analog()
        assert g.n == 1224 and len(comms) == 2
        assert abs(g.m - 16718) <= 2500

    def test_polblogs_heavy_tail(self):
        g, _ = polblogs_analog()
        degs = sorted(g.degrees().values(), reverse=True)
        assert degs[0] > 4 * (2 * g.m / g.n)  # hubs well above the mean

    def test_assortative_blocks(self):
        g, comms = dolphin_analog()
        internal = sum(g.internal_edges(c) for c in comms)
        assert internal / g.m > 0.7

    def test_determinism(self):
        g1, _ = dolphin_analog(seed=7)
        g2, _ = dolphin_analog(seed=7)
        assert sorted(g1.edges()) == sorted(g2.edges())


class TestOverlapping:
    def test_counts_and_overlap(self):
        g, comms = overlapping_communities(n_communities=30, seed=3)
        assert len(comms) == 30
        # some node belongs to >= 2 communities
        from collections import Counter

        member_counts = Counter(v for c in comms for v in c)
        assert max(member_counts.values()) >= 2

    def test_sizes_in_range(self):
        _, comms = overlapping_communities(
            n_communities=20, size_lo=5, size_hi=12, seed=4
        )
        assert all(5 <= len(c) <= 12 for c in comms)


class TestLFR:
    def test_node_count_and_partition(self):
        g, comms = lfr_graph(n=500, seed=1)
        assert g.n == 500
        allv = set()
        for c in comms:
            assert not (allv & c)
            allv |= c
        assert allv == set(range(500))

    @pytest.mark.parametrize("mu", [0.2, 0.3, 0.4])
    def test_mixing_parameter_realized(self, mu):
        g, comms = lfr_graph(n=800, d_avg=16, d_max=40, mu=mu, seed=2)
        comm_of = {}
        for i, c in enumerate(comms):
            for v in c:
                comm_of[v] = i
        external = sum(1 for u, v in g.edges() if comm_of[u] != comm_of[v])
        realized = external / g.m
        assert realized == pytest.approx(mu, abs=0.12)

    def test_average_degree_approx(self):
        g, _ = lfr_graph(n=800, d_avg=16, d_max=40, seed=3)
        avg = 2 * g.m / g.n
        assert avg == pytest.approx(16, rel=0.35)

    def test_max_degree_bounded(self):
        g, _ = lfr_graph(n=500, d_avg=12, d_max=30, seed=4)
        assert max(g.degrees().values()) <= 30

    def test_community_sizes_bounded(self):
        _, comms = lfr_graph(n=600, min_c=10, max_c=80, seed=5)
        assert all(len(c) <= 80 for c in comms)
        assert sum(len(c) for c in comms) == 600

    def test_determinism(self):
        g1, c1 = lfr_graph(n=300, seed=9)
        g2, c2 = lfr_graph(n=300, seed=9)
        assert sorted(g1.edges()) == sorted(g2.edges()) and c1 == c2

    def test_higher_mu_lowers_detectability(self):
        """More mixing → ground-truth community keeps a lower share of
        its nodes' edges internal (the Figure 8 x-axis mechanism)."""

        def internal_frac(mu):
            g, comms = lfr_graph(n=600, d_avg=16, d_max=40, mu=mu, seed=10)
            c = max(comms, key=len)
            l = g.internal_edges(c)
            d = sum(g.degree(v) for v in c)
            return 2 * l / d

        assert internal_frac(0.2) > internal_frac(0.4)
