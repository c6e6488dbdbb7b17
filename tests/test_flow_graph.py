"""Tests for the Even–Tarjan vertex-split flow graph (LOC-CUT core)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.flow.flow_graph import VertexFlowGraph
from repro.graph.local import AdjGraph
from tests.helpers import (
    brute_pair_connectivity,
    clique_edges,
    cycle_edges,
    paper_fig2_graph,
    path_edges,
    random_graph,
)


class TestConstruction:
    def test_node_and_arc_counts(self):
        # paper Fig. 3: n=4 vertices, m=4 edges -> 2n nodes, n+2m arcs
        g = AdjGraph(cycle_edges(4))
        fg = VertexFlowGraph(g, 2)
        assert fg.net.n == 8
        # each add_edge stores forward+reverse, so arcs = 2*(n + 2m)
        assert len(fg.net.to) == 2 * (4 + 2 * 4)


class TestLocalCut:
    def test_adjacent_pair_lemma5(self):
        g = AdjGraph([(0, 1), (1, 2), (0, 2)])
        fg = VertexFlowGraph(g, 5)
        assert fg.local_cut(0, 1) is None

    def test_same_vertex(self):
        g = AdjGraph(cycle_edges(4))
        assert VertexFlowGraph(g, 3).local_cut(2, 2) is None

    def test_path_cut_is_middle(self):
        g = AdjGraph(path_edges(3))  # 0-1-2
        fg = VertexFlowGraph(g, 2)
        assert fg.local_cut(0, 2) == {1}

    def test_cycle_connectivity_two(self):
        g = AdjGraph(cycle_edges(6))
        fg2 = VertexFlowGraph(g, 2)
        assert fg2.local_cut(0, 3) is None  # kappa = 2 >= 2
        fg3 = VertexFlowGraph(g, 3)
        cut = fg3.local_cut(0, 3)
        assert cut is not None and len(cut) == 2

    def test_clique_no_cut(self):
        g = AdjGraph(clique_edges(range(6)))
        fg = VertexFlowGraph(g, 5)
        assert fg.local_cut(0, 3) is None  # adjacent anyway

    def test_paper_overlap_cut(self):
        g, _ = paper_fig2_graph()
        fg = VertexFlowGraph(g, 3)
        cut = fg.local_cut(0, 7)
        assert cut == {3, 4}

    def test_cut_disconnects(self):
        g, _ = paper_fig2_graph()
        cut = VertexFlowGraph(g, 3).local_cut(1, 6)
        rest = g.without_vertices(cut)
        assert not rest.is_connected()

    def test_connectivity_capped_at_k(self):
        g = AdjGraph(clique_edges(range(8)))
        fg = VertexFlowGraph(g, 3)
        assert fg.connectivity(0, 1) == 3  # true kappa is 7, capped

    def test_reusable_across_pairs(self):
        g, _ = paper_fig2_graph()
        fg = VertexFlowGraph(g, 3)
        assert fg.local_cut(0, 7) == {3, 4}
        assert fg.local_cut(0, 7) == {3, 4}  # reset() makes it idempotent
        assert fg.local_cut(0, 1) is None


@settings(max_examples=50, deadline=None)
@given(st.integers(0, 10**9), st.integers(2, 4))
def test_local_cut_matches_brute_force(seed, k):
    g = random_graph(seed, 4, 8)
    if not g.is_connected():
        return
    fg = VertexFlowGraph(g, k)
    verts = g.vertices()
    u, v = verts[0], verts[-1]
    kappa = brute_pair_connectivity(g, u, v)
    cut = fg.local_cut(u, v)
    if u == v or g.has_edge(u, v):
        assert cut is None
    elif kappa >= k:
        assert cut is None
    else:
        assert cut is not None
        assert len(cut) == kappa
        rest = g.without_vertices(cut)
        dist = rest.bfs_dist(u)
        assert v not in dist  # cut really separates u from v


@settings(max_examples=30, deadline=None)
@given(st.integers(0, 10**9))
def test_connectivity_symmetric(seed):
    g = random_graph(seed, 5, 8)
    if not g.is_connected():
        return
    k = 4
    fg = VertexFlowGraph(g, k)
    verts = g.vertices()
    u, v = verts[0], verts[-1]
    if g.has_edge(u, v):
        return
    assert fg.connectivity(u, v) == fg.connectivity(v, u)
