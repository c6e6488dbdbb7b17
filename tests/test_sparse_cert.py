"""Tests for scan-first-search sparse certificates and side-groups."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.brute import vertex_connectivity
from repro.core.sparse_cert import scan_first_forest, side_groups, sparse_certificate
from repro.flow.flow_graph import VertexFlowGraph
from repro.graph.generators import harary
from repro.graph.local import AdjGraph
from tests.helpers import clique_edges, cycle_edges, random_graph


class TestScanFirstForest:
    def test_forest_is_spanning(self):
        g = AdjGraph(cycle_edges(6))
        forest = scan_first_forest(g.adj)
        assert len(forest) == 5  # spanning tree of a connected graph

    def test_forest_per_component(self):
        g = AdjGraph(cycle_edges(3) + cycle_edges(3, offset=10))
        forest = scan_first_forest(g.adj)
        assert len(forest) == 4  # two trees, (3-1) + (3-1)

    def test_forest_acyclic(self):
        g = AdjGraph(clique_edges(range(6)))
        forest = AdjGraph(scan_first_forest(g.adj))
        assert forest.m == forest.n - len(forest.connected_components())

    def test_no_mutation(self):
        g = AdjGraph(cycle_edges(5))
        before = {v: set(n) for v, n in g.adj.items()}
        scan_first_forest(g.adj)
        assert g.adj == before


class TestSparseCertificate:
    def test_edge_bound(self):
        # Thm. 5: at most k(n-1) edges
        for k in (1, 2, 3, 4):
            g = AdjGraph(clique_edges(range(9)))
            cert, forests = sparse_certificate(g, k)
            assert cert.m <= k * (g.n - 1)
            assert len(forests) == k

    def test_subgraph_of_original(self):
        g = AdjGraph(clique_edges(range(7)))
        cert, _ = sparse_certificate(g, 3)
        assert set(cert.edges()) <= set(g.edges())
        assert set(cert.adj) == set(g.adj)

    def test_sparse_graph_unchanged(self):
        g = AdjGraph(cycle_edges(8))
        cert, _ = sparse_certificate(g, 3)
        assert cert.edges() == g.edges()  # cycle has only n edges

    def test_forests_disjoint(self):
        g = AdjGraph(clique_edges(range(8)))
        _, forests = sparse_certificate(g, 4)
        seen = set()
        for f in forests:
            for a, b in f:
                e = (min(a, b), max(a, b))
                assert e not in seen
                seen.add(e)

    @settings(max_examples=40, deadline=None)
    @given(st.integers(0, 10**9), st.integers(1, 4))
    def test_preserves_k_connectivity(self, seed, k):
        # Def. 7: (V, E') is k-connected iff G is
        g = random_graph(seed, 4, 8)
        cert, _ = sparse_certificate(g, k)
        assert (vertex_connectivity(cert) >= k) == (vertex_connectivity(g) >= k)

    @settings(max_examples=25, deadline=None)
    @given(st.integers(0, 10**9))
    def test_preserves_local_connectivity_up_to_k(self, seed):
        # the stronger CKT property GLOBAL-CUT relies on:
        # min(kappa_G(u,v), k) == min(kappa_SC(u,v), k)
        g = random_graph(seed, 4, 7)
        if not g.is_connected():
            return
        k = 3
        cert, _ = sparse_certificate(g, k)
        fg_g = VertexFlowGraph(g, k)
        fg_c = VertexFlowGraph(cert, k)
        for u in g.vertices():
            for v in g.vertices():
                if u >= v or g.has_edge(u, v) or cert.has_edge(u, v):
                    continue
                assert fg_g.connectivity(u, v) == fg_c.connectivity(u, v)


class TestSideGroups:
    def test_groups_from_fk(self):
        # dense graph: F_k components are large -> side-groups exist
        g = AdjGraph(harary(12, 5))
        _, forests = sparse_certificate(g, 3)
        groups = side_groups(forests, 3)
        for cc in groups:
            assert len(cc) > 3

    def test_empty_when_fk_empty(self):
        g = AdjGraph(cycle_edges(6))
        _, forests = sparse_certificate(g, 3)
        # cycle exhausted after 2 forests; F_3 empty
        assert forests[2] == []
        assert side_groups(forests, 3) == []

    def test_groups_disjoint(self):
        g = AdjGraph(harary(14, 6))
        _, forests = sparse_certificate(g, 4)
        groups = side_groups(forests, 4)
        seen = set()
        for cc in groups:
            assert not (cc & seen)
            seen |= cc

    @settings(max_examples=25, deadline=None)
    @given(st.integers(0, 10**9))
    def test_side_group_members_pairwise_k_connected(self, seed):
        # Thm. 10: any two vertices of a side-group are k-locally-connected
        g = random_graph(seed, 6, 9)
        if not g.is_connected():
            return
        k = 3
        cert, forests = sparse_certificate(g, k)
        fg = VertexFlowGraph(cert, k)
        for cc in side_groups(forests, k):
            members = sorted(cc)
            for i, u in enumerate(members):
                for v in members[i + 1 :]:
                    if cert.has_edge(u, v):
                        continue
                    assert fg.connectivity(u, v) >= k
