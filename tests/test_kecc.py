"""Tests for the k-ECC baseline (repro.baselines.kecc)."""
from itertools import combinations

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.kecc import EdgeFlowGraph, global_edge_cut, kecc_local
from repro.graph.generators import planted_kvcc
from repro.graph.local import AdjGraph
from tests.helpers import (
    clique_edges,
    cycle_edges,
    paper_fig2_graph,
    random_graph,
    sorted_sets,
)


def brute_edge_connectivity(g: AdjGraph) -> int:
    """λ(G) by removing every edge subset, smallest first (tiny graphs)."""
    edges = g.edges()
    if g.n <= 1 or not g.is_connected():
        return 0
    for size in range(len(edges) + 1):
        for sub in combinations(edges, size):
            rest = g.without_edges(sub)
            if not rest.is_connected():
                return size
    return len(edges)


class TestEdgeCut:
    def test_cycle_lambda_two(self):
        g = AdjGraph(cycle_edges(6))
        assert global_edge_cut(g, 2) is None
        cut = global_edge_cut(g, 3)
        assert cut is not None and len(cut) == 2

    def test_bridge(self):
        g = AdjGraph(clique_edges(range(4)) + [(3, 4)] + clique_edges(range(4, 8)))
        cut = global_edge_cut(g, 2)
        assert cut == [(3, 4)]

    def test_clique(self):
        g = AdjGraph(clique_edges(range(5)))
        assert global_edge_cut(g, 4) is None

    def test_cut_disconnects(self):
        g, _ = paper_fig2_graph()
        cut = global_edge_cut(g, 5)
        if cut is not None:
            assert not g.without_edges(cut).is_connected()

    @settings(max_examples=40, deadline=None)
    @given(st.integers(0, 10**9), st.integers(2, 4))
    def test_matches_brute_lambda(self, seed, k):
        g = random_graph(seed, 4, 7)
        if not g.is_connected():
            return
        lam = brute_edge_connectivity(g)
        cut = global_edge_cut(g, k)
        if lam >= k:
            assert cut is None
        else:
            # the sweep returns the first qualifying cut it meets, which
            # is a minimum s-v cut for *some* v: any size in [lam, k)
            # is correct for the decomposition
            assert cut is not None
            assert lam <= len(cut) < k
            assert not g.without_edges(cut).is_connected()


class TestKECC:
    def test_bridge_split(self):
        g = AdjGraph(clique_edges(range(4)) + [(3, 4)] + clique_edges(range(4, 8)))
        res = kecc_local(g, 2)
        assert sorted_sets(res) == [[0, 1, 2, 3], [4, 5, 6, 7]]

    def test_shared_vertex_merges(self):
        # paper Fig. 1 point: k-ECCs merge across a shared vertex where
        # k-VCCs split
        from repro.core.kvcc_local import kvcc_enum_local

        pg = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=1, seed=21)
        g = pg.graph()
        eccs = kecc_local(g, 3)
        vccs = kvcc_enum_local(g, 3)
        assert len(eccs) == 1  # single vertex shared -> one 3-ECC
        assert len(vccs) == 3  # but three 3-VCCs

    def test_every_output_k_edge_connected(self):
        for seed in range(8):
            g = random_graph(seed, 6, 9)
            for k in (2, 3):
                for comp in kecc_local(g, k):
                    sub = g.induced(comp)
                    assert brute_edge_connectivity(sub) >= k

    def test_outputs_disjoint(self):
        # unlike k-VCCs, k-ECCs cannot overlap
        for seed in range(8):
            g = random_graph(seed, 7, 10)
            res = kecc_local(g, 2)
            for i in range(len(res)):
                for j in range(i + 1, len(res)):
                    assert not (res[i] & res[j])

    def test_maximality_vs_brute(self):
        # for tiny graphs compare against subset-enumeration of maximal
        # k-edge-connected induced subgraphs
        def brute_keccs(g, k):
            cands = []
            for size in range(2, g.n + 1):
                for sub in combinations(g.vertices(), size):
                    s = g.induced(sub)
                    if s.is_connected() and brute_edge_connectivity(s) >= k:
                        cands.append(set(sub))
            return sorted_sets([s for s in cands if not any(s < t for t in cands)])

        for seed in range(8):
            g = random_graph(seed, 4, 6)
            assert sorted_sets(kecc_local(g, 2)) == brute_keccs(g, 2)

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            kecc_local(AdjGraph([(0, 1)]), 0)

    def test_k1_is_components(self):
        g = AdjGraph([(0, 1), (2, 3), (3, 4)])
        assert sorted_sets(kecc_local(g, 1)) == [[0, 1], [2, 3, 4]]
