"""The eleven §6.1 baselines: structural invariants and reference checks."""
import networkx as nx
import pytest

from repro.baselines import (
    clique_cs,
    cnm,
    gn,
    highcore,
    hightruss,
    huang2015,
    icwi2008,
    kc,
    kecc_cs,
    kt,
    wu2015,
)
from repro.gendata.classic import karate, ring_of_cliques
from repro.gendata.lfr import lfr_graph
from repro.graphs.local import LocalGraph
from repro.graphs.localops import core_numbers, truss_numbers

from .util import random_local_graph, to_nx


@pytest.fixture(scope="module")
def kg():
    return karate()


@pytest.fixture(scope="module")
def lfr_small():
    return lfr_graph(n=300, d_avg=12, d_max=30, mu=0.3, min_c=10, max_c=60, seed=5)


class TestKC:
    def test_min_degree_property(self, kg):
        g, _ = kg
        r = kc(g, [0], k=3)
        sub = g.subgraph(r)
        assert min(len(sub.adj[v]) for v in sub.adj) >= 3

    def test_connected_contains_query(self, kg):
        g, _ = kg
        r = kc(g, [33], k=2)
        assert 33 in r and g.subgraph(r).is_connected()

    def test_matches_networkx_core_component(self, kg):
        g, _ = kg
        r = kc(g, [0], k=3)
        core = nx.k_core(to_nx(g), 3)
        want = nx.node_connected_component(core, 0)
        assert r == set(want)

    def test_query_below_core_none(self, kg):
        g, _ = kg
        # node 11 has degree 1 → not in any 3-core
        assert kc(g, [11], k=3) is None

    def test_multi_query(self, kg):
        g, _ = kg
        r = kc(g, [0, 33], k=3)
        assert r is None or {0, 33} <= r


class TestHighcore:
    def test_returns_highest_k(self, kg):
        g, _ = kg
        r = highcore(g, [0])
        cores = core_numbers(g)
        assert r is not None and 0 in r
        # every member is in the k-core at q's own core number
        assert all(cores[v] >= cores[0] for v in r)

    def test_low_degree_query(self, kg):
        g, _ = kg
        r = highcore(g, [11])
        assert r is not None and 11 in r


class TestKT:
    def test_support_property(self, kg):
        g, _ = kg
        r = kt(g, [0], k=4)
        sub = g.subgraph(r)
        for u, v in sub.edges():
            assert len(sub.adj[u] & sub.adj[v]) >= 1  # connected truss comp

    def test_contains_query(self, kg):
        g, _ = kg
        r = kt(g, [0], k=4)
        assert r is not None and 0 in r

    def test_absent_from_truss_none(self, kg):
        g, _ = kg
        assert kt(g, [11], k=4) is None  # degree-1 node in no 4-truss

    def test_hightruss_max_k(self, kg):
        g, _ = kg
        r = hightruss(g, [0])
        t = truss_numbers(g)
        k_q = max(tv for (u, v), tv in t.items() if u == 0 or v == 0)
        sub_edges = [e for e, tv in t.items() if tv >= k_q]
        sub = LocalGraph.from_edges(sub_edges)
        assert r == sub.connected_component(0)


class TestHuang2015:
    def test_connected_contains_queries(self, kg):
        g, _ = kg
        r = huang2015(g, [0, 2])
        assert {0, 2} <= r and g.subgraph(r).is_connected()

    def test_not_singleton(self, lfr_small):
        g, comms = lfr_small
        q = next(iter(comms[0]))
        r = huang2015(g, [q])
        assert r is not None and len(r) >= 2

    def test_reduces_query_distance(self, kg):
        g, _ = kg
        r = huang2015(g, [33])
        sub = g.subgraph(r)
        assert max(sub.bfs_dist([33]).values()) <= g.eccentricity(33)


class TestKECC_CS:
    def test_edge_connectivity_exact(self):
        g = random_local_graph(25, 0.3, 31)
        comp = max(g.connected_components(), key=len)
        q = min(comp)
        r = kecc_cs(g, [q], k=2, exact_limit=100)
        if r is not None:
            assert nx.edge_connectivity(to_nx(g.subgraph(r))) >= 2

    def test_contains_queries(self, kg):
        g, _ = kg
        r = kecc_cs(g, [0, 1], k=2)
        assert r is None or {0, 1} <= r

    def test_heuristic_path(self, lfr_small):
        g, comms = lfr_small
        q = next(iter(comms[0]))
        r = kecc_cs(g, [q], k=3, exact_limit=10)  # force heuristic
        assert r is None or q in r


class TestClique:
    def test_karate_contains_query(self, kg):
        g, _ = kg
        r = clique_cs(g, [0])
        assert r is not None and 0 in r

    def test_ring_returns_clique(self):
        g, comms = ring_of_cliques(6, 5)
        r = clique_cs(g, [0])
        assert r == comms[0]

    def test_budget_returns_none(self, kg):
        g, _ = kg
        assert clique_cs(g, [0], max_nodes=5) is None


class TestCNM:
    def test_contains_queries(self, kg):
        g, _ = kg
        r = cnm(g, [0, 1])
        assert r is not None and {0, 1} <= r

    def test_two_triangles(self):
        g = LocalGraph.from_edges(
            [(0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3), (0, 3)]
        )
        r = cnm(g, [1])
        assert r == {0, 1, 2}

    def test_ring_small_community(self):
        g, comms = ring_of_cliques(8, 5)
        r = cnm(g, [0])
        # CNM + DM selection: community containing q should stay cliquey
        assert 0 in r and len(r) <= 2 * 5


class TestGN:
    def test_karate(self, kg):
        g, _ = kg
        r = gn(g, [0])
        assert 0 in r and g.subgraph(r).is_connected()

    def test_budget_none(self, kg):
        g, _ = kg
        assert gn(g, [0], max_nodes=5) is None

    def test_two_triangles(self):
        g = LocalGraph.from_edges(
            [(0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3), (0, 3)]
        )
        assert gn(g, [4]) == {3, 4, 5}


class TestLuo:
    def test_contains_query_connected(self, kg):
        g, _ = kg
        r = icwi2008(g, [0])
        assert 0 in r and g.subgraph(r).is_connected()

    def test_two_triangles(self):
        g = LocalGraph.from_edges(
            [(0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3), (0, 3)]
        )
        r = icwi2008(g, [1])
        assert {0, 1, 2} <= r


class TestWu2015:
    def test_contains_query_near_query(self, kg):
        g, _ = kg
        r = wu2015(g, [0])
        assert 0 in r

    def test_prefers_near_nodes(self):
        g, comms = ring_of_cliques(10, 6)
        r = wu2015(g, [0])
        # distance-decayed density: the result hugs the query's clique
        sub = g.subgraph(r)
        assert max(sub.bfs_dist([0]).values()) <= 3

    def test_budget_none(self, kg):
        g, _ = kg
        assert wu2015(g, [0], max_nodes=5) is None


class TestAllReturnValidSets:
    """Uniform contract across the roster on a small LFR graph."""

    @pytest.mark.parametrize(
        "name",
        ["kc", "kt", "kecc", "clique", "CNM", "icwi2008", "huang2015",
         "wu2015", "highcore", "hightruss"],
    )
    def test_contract(self, name, lfr_small):
        from repro.evaluation.harness import standard_algorithms

        g, comms = lfr_small
        q = sorted(max(comms, key=len))[0]
        algos = standard_algorithms(g, include=[name], gn_max_nodes=0)
        r = algos[name](g, [q])
        if r is not None:
            assert q in r
            assert isinstance(r, set)
