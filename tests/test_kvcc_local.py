"""Tests for the KVCC-ENUM local kernel: correctness vs brute force and
ground truth, paper invariants (Thm. 2/3/6, Property 1), and variant
equivalence."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.kcore_baseline import kcore_components_local
from repro.baselines.kecc import kecc_local
from repro.core.brute import brute_kvccs, is_k_connected, vertex_connectivity
from repro.core.global_cut import CutCounters
from repro.core.kvcc_local import VARIANTS, kvcc_enum_local, overlap_partition
from repro.graph.generators import planted_kvcc, snap_analog
from repro.graph.local import AdjGraph
from tests.helpers import (
    clique_edges,
    cycle_edges,
    paper_fig2_graph,
    random_graph,
    sorted_sets,
)


class TestOverlapPartition:
    def test_paper_fig2(self):
        g, truth = paper_fig2_graph()
        parts = overlap_partition(g, {3, 4})
        assert sorted_sets(set(p.adj) for p in parts) == sorted_sets(truth)

    def test_cut_duplicated_with_induced_edges(self):
        g, _ = paper_fig2_graph()
        for part in overlap_partition(g, {3, 4}):
            assert {3, 4} <= set(part.adj)
            assert part.has_edge(3, 4)  # induced edge inside the cut

    def test_part_count_matches_components(self):
        g = AdjGraph(
            clique_edges([0, 1, 2]) + clique_edges([0, 3, 4]) + clique_edges([0, 5, 6])
        )
        parts = overlap_partition(g, {0})
        assert len(parts) == 3


class TestNamedGraphs:
    @pytest.mark.parametrize("variant", list(VARIANTS))
    def test_paper_fig2(self, variant):
        g, truth = paper_fig2_graph()
        assert sorted_sets(kvcc_enum_local(g, 3, variant=variant)) == sorted_sets(truth)

    @pytest.mark.parametrize("variant", list(VARIANTS))
    def test_clique_single_vcc(self, variant):
        g = AdjGraph(clique_edges(range(7)))
        assert kvcc_enum_local(g, 6, variant=variant) == [set(range(7))]

    @pytest.mark.parametrize("variant", list(VARIANTS))
    def test_clique_too_small(self, variant):
        # K_k is not a k-VCC: |V| > k is required (Def. 2)
        g = AdjGraph(clique_edges(range(4)))
        assert kvcc_enum_local(g, 4, variant=variant) == []

    @pytest.mark.parametrize("variant", list(VARIANTS))
    def test_cycle_is_2vcc(self, variant):
        g = AdjGraph(cycle_edges(9))
        assert kvcc_enum_local(g, 2, variant=variant) == [set(range(9))]
        assert kvcc_enum_local(g, 3, variant=variant) == []

    def test_disconnected_input(self):
        g = AdjGraph(clique_edges(range(4)) + clique_edges(range(10, 14)))
        res = kvcc_enum_local(g, 3)
        assert sorted_sets(res) == [[0, 1, 2, 3], [10, 11, 12, 13]]

    def test_k1_components(self):
        # 1-VCCs are connected components with >= 2 vertices
        g = AdjGraph([(0, 1), (2, 3), (3, 4)])
        assert sorted_sets(kvcc_enum_local(g, 1)) == [[0, 1], [2, 3, 4]]

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            kvcc_enum_local(AdjGraph([(0, 1)]), 0)

    def test_invalid_variant(self):
        with pytest.raises(KeyError):
            kvcc_enum_local(AdjGraph([(0, 1)]), 2, variant="nope")


class TestPlantedGroundTruth:
    @pytest.mark.parametrize("variant", list(VARIANTS))
    @pytest.mark.parametrize(
        "n_comms,comm_size,k,overlap,bridges,chords,seed",
        [
            (3, 10, 3, 2, 0, 0, 0),
            (3, 10, 3, 0, 2, 0, 1),
            (4, 12, 4, 2, 0, 4, 2),
            (4, 12, 4, 0, 3, 4, 3),
            (5, 14, 5, 4, 0, 6, 4),
            (2, 16, 6, 5, 0, 8, 5),
            (6, 11, 3, 1, 0, 2, 6),
            (3, 15, 7, 0, 6, 10, 7),
        ],
    )
    def test_recovers_communities(
        self, variant, n_comms, comm_size, k, overlap, bridges, chords, seed
    ):
        pg = planted_kvcc(
            n_comms=n_comms,
            comm_size=comm_size,
            k=k,
            overlap=overlap,
            bridges=bridges,
            extra_chords=chords,
            seed=seed,
        )
        got = kvcc_enum_local(pg.graph(), k, variant=variant)
        assert sorted_sets(got) == sorted_sets(pg.communities)

    def test_higher_k_dissolves(self):
        pg = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=2, seed=9)
        # communities are exactly 3-connected Harary graphs: at k=4 the
        # enumeration must return nothing
        assert kvcc_enum_local(pg.graph(), 4) == []


class TestAgainstBruteForce:
    @settings(max_examples=50, deadline=None)
    @given(st.integers(0, 10**9), st.integers(2, 3))
    def test_matches_brute(self, seed, k):
        g = random_graph(seed, 4, 8)
        expected = brute_kvccs(g, k)
        for variant in VARIANTS:
            got = kvcc_enum_local(g, k, variant=variant)
            assert sorted_sets(got) == sorted_sets(expected)

    @settings(max_examples=25, deadline=None)
    @given(st.integers(0, 10**9))
    def test_variants_identical(self, seed):
        g = random_graph(seed, 6, 10)
        results = {
            v: sorted_sets(kvcc_enum_local(g, 3, variant=v)) for v in VARIANTS
        }
        vals = list(results.values())
        assert all(v == vals[0] for v in vals)


class TestPaperInvariants:
    def _enum(self, seed, k):
        g = random_graph(seed, 8, 14)
        return g, kvcc_enum_local(g, k)

    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [2, 3, 4])
    def test_every_output_k_connected(self, seed, k):
        g, res = self._enum(seed, k)
        for vcc in res:
            sub = g.induced(vcc)
            assert sub.n > k
            assert is_k_connected(sub, k)

    @pytest.mark.parametrize("seed", range(8))
    def test_overlap_bound_property1(self, seed):
        k = 3
        g, res = self._enum(seed, k)
        for i in range(len(res)):
            for j in range(i + 1, len(res)):
                assert len(res[i] & res[j]) < k

    @pytest.mark.parametrize("seed", range(8))
    def test_count_bound_theorem6(self, seed):
        k = 3
        g, res = self._enum(seed, k)
        assert len(res) <= g.n / 2

    @pytest.mark.parametrize("seed", range(8))
    def test_no_nesting_lemma3(self, seed):
        k = 2
        g, res = self._enum(seed, k)
        for i in range(len(res)):
            for j in range(len(res)):
                if i != j:
                    assert not res[i] <= res[j]

    @pytest.mark.parametrize("seed", range(6))
    def test_diameter_bound_theorem2(self, seed):
        from repro.graph.metrics import diameter_local

        k = 3
        g, res = self._enum(seed, k)
        for vcc in res:
            sub = g.induced(vcc)
            kappa = vertex_connectivity(sub)
            assert diameter_local(sub) <= (sub.n - 2) // kappa + 1

    @pytest.mark.parametrize("seed", range(6))
    def test_nesting_theorem3(self, seed):
        # every k-VCC inside some k-ECC inside some k-core component
        k = 3
        g, res = self._enum(seed, k)
        eccs = kecc_local(g, k)
        cores = kcore_components_local(g, k)
        for vcc in res:
            assert any(vcc <= e for e in eccs)
            assert any(vcc <= c for c in cores)

    def test_planted_overlap_vertices_shared(self):
        pg = planted_kvcc(n_comms=3, comm_size=12, k=4, overlap=3, seed=11)
        res = kvcc_enum_local(pg.graph(), 4)
        # consecutive communities share exactly `overlap` vertices
        res = sorted_sets(res)
        for a, b in zip(res, res[1:]):
            assert len(set(a) & set(b)) == 3


class TestCountersIntegration:
    def test_counters_accumulate_across_recursion(self):
        pg = planted_kvcc(n_comms=4, comm_size=12, k=4, overlap=2, seed=13)
        c = CutCounters()
        kvcc_enum_local(pg.graph(), 4, counters=c)
        assert c.global_cut_calls >= 4  # one per final VCC at minimum
        assert c.partitions >= 3  # 4 communities need >= 3 splits
        assert c.phase1_total() > 0

    def test_sweeps_reduce_tests(self):
        g = snap_analog("dblp", scale=0.5).graph()
        base, star = CutCounters(), CutCounters()
        kvcc_enum_local(g, 10, variant="vcce", counters=base)
        kvcc_enum_local(g, 10, variant="vcce-star", counters=star)
        assert star.loc_cut_calls < base.loc_cut_calls

    def test_partitions_bounded_lemma10(self):
        for seed in range(6):
            g = random_graph(seed, 8, 14)
            c = CutCounters()
            kvcc_enum_local(g, 3, counters=c)
            assert c.partitions <= max(0, (g.n - 3 - 1) // 2) + 1
