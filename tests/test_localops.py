"""Sequential decomposition mirrors vs networkx references."""
import networkx as nx
import pytest

from repro.gendata.classic import karate, ring_of_cliques
from repro.graphs import localops
from repro.graphs.kecc import kecc, kecc_exact, kecc_superset

from .util import GNP_CASES, random_local_graph, to_nx


class TestCoreNumbers:
    @pytest.mark.parametrize("n,p,seed", GNP_CASES)
    def test_vs_networkx(self, n, p, seed):
        g = random_local_graph(n, p, seed)
        assert localops.core_numbers(g) == nx.core_number(to_nx(g))

    def test_karate(self):
        g, _ = karate()
        assert localops.core_numbers(g) == nx.core_number(to_nx(g))

    def test_k_core_subgraph(self):
        g, _ = karate()
        ours = sorted(localops.k_core(g, 3).adj)
        assert ours == sorted(nx.k_core(to_nx(g), 3).nodes())

    def test_clique_core(self):
        g = random_local_graph(6, 1.1, 0)  # complete K6
        assert set(localops.core_numbers(g).values()) == {5}


class TestTrussNumbers:
    @pytest.mark.parametrize("k", [3, 4, 5])
    def test_k_truss_vs_networkx_karate(self, k):
        g, _ = karate()
        ours = sorted(localops.k_truss(g, k).edges())
        theirs = sorted(
            (min(u, v), max(u, v)) for u, v in nx.k_truss(to_nx(g), k).edges()
        )
        assert ours == theirs

    @pytest.mark.parametrize("n,p,seed", GNP_CASES[:5])
    @pytest.mark.parametrize("k", [3, 4])
    def test_k_truss_vs_networkx_random(self, n, p, seed, k):
        g = random_local_graph(n, p, seed)
        ours = sorted(localops.k_truss(g, k).edges())
        theirs = sorted(
            (min(u, v), max(u, v)) for u, v in nx.k_truss(to_nx(g), k).edges()
        )
        assert ours == theirs

    def test_truss_of_clique(self):
        g = random_local_graph(6, 1.1, 0)  # K6: every edge in 4 triangles
        assert set(localops.truss_numbers(g).values()) == {6}

    def test_ring_of_cliques_truss(self):
        g, _ = ring_of_cliques(4, 5)
        t = localops.truss_numbers(g)
        # intra-clique edges reach truss 5; bridges have truss 2
        assert max(t.values()) == 5 and min(t.values()) == 2


class TestKECC:
    @pytest.mark.parametrize("n,p,seed", [(12, 0.35, 1), (16, 0.3, 2), (20, 0.25, 3)])
    def test_exact_vs_networkx_k2(self, n, p, seed):
        # for k=2 the induced-subgraph and pairwise-connectivity
        # definitions of k-edge-connected components coincide
        g = random_local_graph(n, p, seed)
        ours = sorted(sorted(c) for c in kecc_exact(g, 2) if len(c) > 1)
        theirs = sorted(
            sorted(c) for c in nx.k_edge_components(to_nx(g), 2) if len(c) > 1
        )
        assert ours == theirs

    @pytest.mark.parametrize("n,p,seed", [(12, 0.35, 1), (16, 0.3, 2), (20, 0.25, 3)])
    @pytest.mark.parametrize("k", [3, 4])
    def test_exact_induced_subgraph_property(self, n, p, seed, k):
        """For k>=3 networkx computes pairwise-connectivity classes — a
        different (coarser) notion than Chang et al.'s induced-subgraph
        k-ECCs. Check the induced-subgraph definition directly instead:
        every component's induced subgraph has edge connectivity >= k,
        and each is contained in one of networkx's (coarser) classes."""
        g = random_local_graph(n, p, seed)
        G = to_nx(g)
        classes = [set(c) for c in nx.k_edge_components(G, k)]
        for c in kecc_exact(g, k):
            if len(c) > 1:
                assert nx.edge_connectivity(G.subgraph(c)) >= k
                assert any(c <= cls for cls in classes)

    def test_superset_contains_exact(self):
        g = random_local_graph(30, 0.2, 5)
        exact = [c for c in kecc_exact(g, 3) if len(c) > 1]
        sup = kecc_superset(g, 3)
        for c in exact:
            assert any(c <= s for s in sup), "heuristic must be a superset"

    def test_dispatch_by_size(self):
        g = random_local_graph(20, 0.3, 6)
        assert sorted(map(sorted, kecc(g, 2, exact_limit=100))) == sorted(
            map(sorted, kecc_exact(g, 2))
        )

    def test_two_triangles_with_bridge(self):
        from repro.graphs.local import LocalGraph

        g = LocalGraph.from_edges(
            [(0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3), (0, 3)]
        )
        comps = sorted(sorted(c) for c in kecc_exact(g, 2) if len(c) > 1)
        assert comps == [[0, 1, 2], [3, 4, 5]]
