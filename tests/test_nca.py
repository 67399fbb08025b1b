"""NCA invariants and behaviours (§5.4)."""
import pytest

from repro.core import dm_of, nca, nca_dr
from repro.gendata.classic import karate, ring_of_cliques
from repro.gendata.lfr import lfr_graph

from .util import GNP_CASES, random_local_graph


class TestInvariants:
    @pytest.mark.parametrize("q", [0, 16, 33])
    def test_karate(self, q):
        g, _ = karate()
        r = nca(g, [q])
        assert q in r and g.subgraph(r).is_connected()

    @pytest.mark.parametrize("n,p,seed", GNP_CASES[:6])
    def test_random_graphs(self, n, p, seed):
        g = random_local_graph(n, p, seed)
        comp = max(g.connected_components(), key=len)
        q = min(comp)
        r = nca(g, [q])
        assert q in r and g.subgraph(r).is_connected()
        assert dm_of(g, r) >= dm_of(g, comp) - 1e-12

    def test_missing_query_none(self):
        g, _ = karate()
        assert nca(g, [999]) is None

    def test_disconnected_queries_none(self):
        from repro.graphs.local import LocalGraph

        g = LocalGraph.from_edges([(0, 1), (2, 3)])
        assert nca(g, [0, 3]) is None

    def test_multi_query_kept(self):
        g, _ = karate()
        r = nca(g, [0, 33])
        assert {0, 33} <= r and g.subgraph(r).is_connected()

    def test_ring_returns_single_clique(self):
        g, comms = ring_of_cliques(10, 6)
        r = nca(g, [0])
        assert r == comms[0]

    def test_determinism(self):
        g, _ = karate()
        assert nca(g, [5]) == nca(g, [5])


class TestVariantsAndBudget:
    def test_nca_dr_valid(self):
        g, _ = karate()
        r = nca_dr(g, [33])
        assert 33 in r and g.subgraph(r).is_connected()

    def test_time_budget_returns_incumbent(self):
        g, comms = lfr_graph(n=300, d_avg=12, d_max=30, mu=0.3, seed=6)
        q = next(iter(comms[0]))
        r = nca(g, [q], time_budget=0.0)  # expires immediately
        # incumbent = the initial component
        assert r is not None and q in r

    def test_query_never_removed(self):
        g, _ = karate()
        for q in range(0, 34, 7):
            assert q in nca(g, [q])
