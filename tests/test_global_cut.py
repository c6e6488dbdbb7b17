"""Tests for GLOBAL-CUT / GLOBAL-CUT* (paper Alg. 2 / Alg. 3)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.brute import vertex_connectivity
from repro.core.global_cut import CutCounters, global_cut
from repro.core.kvcc_local import VARIANTS
from repro.graph.generators import harary
from repro.graph.local import AdjGraph
from tests.helpers import (
    clique_edges,
    cycle_edges,
    paper_fig2_graph,
    random_graph,
)

ALL_FLAGS = list(VARIANTS.values())


@pytest.mark.parametrize("ns,gs", ALL_FLAGS)
class TestAllVariants:
    def test_clique_is_k_connected(self, ns, gs):
        g = AdjGraph(clique_edges(range(6)))
        assert global_cut(g, 5, neighbor_sweep=ns, group_sweep=gs) is None

    def test_overlap_cut_found(self, ns, gs):
        g, _ = paper_fig2_graph()
        cut = global_cut(g, 3, neighbor_sweep=ns, group_sweep=gs)
        assert cut == {3, 4}

    def test_cycle(self, ns, gs):
        g = AdjGraph(cycle_edges(8))
        assert global_cut(g, 2, neighbor_sweep=ns, group_sweep=gs) is None
        cut = global_cut(g, 3, neighbor_sweep=ns, group_sweep=gs)
        assert cut is not None and len(cut) == 2

    def test_harary_exact_connectivity(self, ns, gs):
        g = AdjGraph(harary(12, 4))
        assert global_cut(g, 4, neighbor_sweep=ns, group_sweep=gs) is None
        cut = global_cut(g, 5, neighbor_sweep=ns, group_sweep=gs)
        assert cut is not None and len(cut) == 4

    def test_cut_disconnects_graph(self, ns, gs):
        g, _ = paper_fig2_graph()
        cut = global_cut(g, 3, neighbor_sweep=ns, group_sweep=gs)
        rest = g.without_vertices(cut)
        assert not rest.is_connected()

    def test_star_needs_phase2(self, ns, gs):
        # star-of-cliques: the min-degree source may itself be the cut
        # vertex, exercising phase 2 (Lemma 4)
        g = AdjGraph(
            clique_edges([0, 1, 2, 3]) + clique_edges([0, 4, 5, 6])
        )
        cut = global_cut(g, 2, neighbor_sweep=ns, group_sweep=gs)
        assert cut == {0}


class TestCounters:
    def test_basic_tests_everything(self):
        g = AdjGraph(clique_edges(range(6)))
        c = CutCounters()
        global_cut(g, 3, neighbor_sweep=False, group_sweep=False, counters=c)
        # basic: every non-source vertex visited and tested
        assert c.tested == 5
        assert c.source == 1
        assert sum(c.pruned.values()) == 0

    def test_star_prunes(self):
        g = AdjGraph(clique_edges(range(8)))
        c = CutCounters()
        global_cut(g, 3, counters=c)
        assert sum(c.pruned.values()) > 0
        assert c.phase1_total() == 8

    def test_proportions_sum_to_one(self):
        g, _ = paper_fig2_graph()
        c = CutCounters()
        global_cut(g, 3, counters=c)
        props = c.proportions()
        assert abs(sum(props.values()) - 1.0) < 1e-9

    def test_no_fallbacks_on_random_graphs(self):
        c = CutCounters()
        for seed in range(30):
            g = random_graph(seed, 5, 9)
            if g.is_connected():
                global_cut(g, 3, counters=c)
        assert c.fallbacks == 0

    def test_loc_cut_calls_counted(self):
        g = AdjGraph(cycle_edges(6))
        c = CutCounters()
        global_cut(g, 2, neighbor_sweep=False, group_sweep=False, counters=c)
        assert c.loc_cut_calls >= c.tested > 0


class TestAgainstBruteForce:
    @settings(max_examples=60, deadline=None)
    @given(st.integers(0, 10**9), st.integers(2, 4))
    def test_detects_k_connectivity_exactly(self, seed, k):
        g = random_graph(seed, 4, 8)
        if not g.is_connected():
            return
        kappa = vertex_connectivity(g)
        for ns, gs in ALL_FLAGS:
            cut = global_cut(g, k, neighbor_sweep=ns, group_sweep=gs)
            if kappa >= k or g.n <= k:
                # k-connected (or complete-graph regime): no cut < k.
                # NB: for complete graphs no vertex cut exists at all.
                if kappa >= k:
                    assert cut is None
            if cut is not None:
                assert len(cut) < k
                rest = g.without_vertices(cut)
                assert not rest.is_connected()
            else:
                # no cut found: either truly k-connected or complete
                assert kappa >= k or g.m == g.n * (g.n - 1) // 2

    @settings(max_examples=30, deadline=None)
    @given(st.integers(0, 10**9))
    def test_variants_agree_on_existence(self, seed):
        g = random_graph(seed, 5, 8)
        if not g.is_connected():
            return
        k = 3
        outcomes = {
            (ns, gs): global_cut(g, k, neighbor_sweep=ns, group_sweep=gs) is None
            for ns, gs in ALL_FLAGS
        }
        assert len(set(outcomes.values())) == 1
