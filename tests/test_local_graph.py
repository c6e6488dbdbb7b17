"""Unit tests for the local adjacency substrate (repro.graph.local)."""
import pytest

from repro.graph.local import AdjGraph
from tests.helpers import clique_edges, cycle_edges, path_edges


class TestConstruction:
    def test_empty(self):
        g = AdjGraph()
        assert g.n == 0 and g.m == 0
        assert g.vertices() == []
        assert g.edges() == []

    def test_isolated_vertices(self):
        g = AdjGraph(vertices=[3, 1, 2])
        assert g.n == 3 and g.m == 0
        assert g.vertices() == [1, 2, 3]

    def test_self_loop_dropped(self):
        g = AdjGraph([(1, 1), (1, 2)])
        assert g.m == 1
        assert not g.has_edge(1, 1)

    def test_parallel_edges_collapse(self):
        g = AdjGraph([(1, 2), (2, 1), (1, 2)])
        assert g.m == 1

    def test_edges_canonical_sorted(self):
        g = AdjGraph([(5, 2), (1, 3), (3, 1)])
        assert g.edges() == [(1, 3), (2, 5)]

    def test_copy_is_deep(self):
        g = AdjGraph([(1, 2)])
        h = g.copy()
        h.add_edge(2, 3)
        assert g.m == 1 and h.m == 2


class TestAccessors:
    def test_degree_and_neighbors(self):
        g = AdjGraph(clique_edges(range(4)))
        assert all(g.degree(v) == 3 for v in range(4))
        assert g.neighbors(0) == {1, 2, 3}

    def test_min_degree_vertex_tie_break(self):
        g = AdjGraph([(1, 2), (2, 3), (3, 4)])
        # degree-1 vertices are 1 and 4; smallest id wins
        assert g.min_degree_vertex() == 1

    def test_counts(self):
        g = AdjGraph(cycle_edges(6))
        assert g.n == 6 and g.m == 6


class TestSubgraphs:
    def test_induced(self):
        g = AdjGraph(clique_edges(range(5)))
        sub = g.induced({0, 1, 2})
        assert sub.n == 3 and sub.m == 3

    def test_induced_keeps_isolated_members(self):
        g = AdjGraph(path_edges(4))
        sub = g.induced({0, 3})
        assert sub.n == 2 and sub.m == 0

    def test_without_vertices(self):
        g = AdjGraph(cycle_edges(5))
        rest = g.without_vertices({0})
        assert rest.n == 4 and rest.m == 3

    def test_without_edges(self):
        g = AdjGraph(cycle_edges(4))
        rest = g.without_edges([(0, 1), (2, 3)])
        assert rest.n == 4 and rest.m == 2

    def test_without_edges_ignores_missing(self):
        g = AdjGraph([(1, 2)])
        assert g.without_edges([(7, 9)]).m == 1


class TestTraversal:
    def test_components_single(self):
        g = AdjGraph(cycle_edges(5))
        assert g.connected_components() == [set(range(5))]

    def test_components_multi_ordered(self):
        g = AdjGraph(cycle_edges(3) + cycle_edges(3, offset=10))
        comps = g.connected_components()
        assert comps == [{0, 1, 2}, {10, 11, 12}]

    def test_components_isolated_vertex(self):
        g = AdjGraph([(1, 2)], vertices=[5])
        assert g.connected_components() == [{1, 2}, {5}]

    def test_is_connected(self):
        assert AdjGraph(path_edges(5)).is_connected()
        assert not AdjGraph([(0, 1), (2, 3)]).is_connected()
        assert AdjGraph().is_connected()  # degenerate

    def test_bfs_dist_path(self):
        g = AdjGraph(path_edges(5))
        assert g.bfs_dist(0) == {0: 0, 1: 1, 2: 2, 3: 3, 4: 4}

    def test_bfs_dist_unreachable_absent(self):
        g = AdjGraph([(0, 1), (2, 3)])
        assert set(g.bfs_dist(0)) == {0, 1}


class TestKCore:
    def test_clique_stable(self):
        g = AdjGraph(clique_edges(range(5)))
        assert g.k_core(4).n == 5

    def test_path_dissolves(self):
        g = AdjGraph(path_edges(6))
        assert g.k_core(2).n == 0

    def test_cascade(self):
        # clique + pendant chain: chain peels away entirely at k=2
        g = AdjGraph(clique_edges(range(4)) + [(3, 10), (10, 11)])
        core = g.k_core(3)
        assert set(core.adj) == {0, 1, 2, 3}

    def test_k_zero_noop(self):
        g = AdjGraph(path_edges(4))
        assert g.k_core(0).n == 4

    @pytest.mark.parametrize("k", [1, 2, 3, 4, 5])
    def test_min_degree_property(self, k):
        from tests.helpers import random_graph

        for seed in range(5):
            core = random_graph(seed * 97 + k, 6, 14).k_core(k)
            assert all(core.degree(v) >= k for v in core.adj)

    def test_maximality(self):
        # every vertex removed by k_core really cannot be in any k-core
        from tests.helpers import random_graph

        g = random_graph(123, 8, 12)
        k = 3
        core = g.k_core(k)
        removed = set(g.adj) - set(core.adj)
        for v in removed:
            # adding v back (with its surviving neighbors) must break
            # min-degree for someone
            cand = g.induced(set(core.adj) | {v})
            assert min(cand.degree(u) for u in cand.adj) < k or cand.n == 0
