"""Tests for the synthetic graph generators (SNAP-analog substitution)."""
import pytest

from repro.core.brute import vertex_connectivity
from repro.graph.generators import (
    SNAP_ANALOGS,
    chung_lu,
    harary,
    planted_kvcc,
    snap_analog,
    stats,
)
from repro.graph.local import AdjGraph


class TestHarary:
    @pytest.mark.parametrize(
        "n,k",
        [(6, 2), (7, 2), (8, 3), (9, 3), (10, 4), (11, 4), (11, 5), (12, 5), (9, 5)],
    )
    def test_exact_connectivity(self, n, k):
        g = AdjGraph(harary(n, k))
        assert g.n == n
        assert vertex_connectivity(g) == k

    @pytest.mark.parametrize("n,k", [(8, 3), (10, 4), (12, 5)])
    def test_minimum_edge_count(self, n, k):
        # H(k, n) has ceil(kn/2) edges
        g = AdjGraph(harary(n, k))
        assert g.m == -(-k * n // 2)

    def test_offset(self):
        es = harary(5, 2, offset=100)
        assert min(min(e) for e in es) == 100

    def test_invalid_args(self):
        with pytest.raises(ValueError):
            harary(5, 5)
        with pytest.raises(ValueError):
            harary(5, 0)


class TestPlanted:
    def test_deterministic(self):
        a = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=2, seed=7)
        b = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=2, seed=7)
        assert a.edges == b.edges and a.communities == b.communities

    def test_seed_changes_graph(self):
        a = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=2, extra_chords=5, seed=1)
        b = planted_kvcc(n_comms=3, comm_size=10, k=3, overlap=2, extra_chords=5, seed=2)
        assert a.edges != b.edges

    def test_overlap_structure(self):
        pg = planted_kvcc(n_comms=4, comm_size=10, k=4, overlap=3, seed=0)
        for a, b in zip(pg.communities, pg.communities[1:]):
            assert len(a & b) == 3

    def test_bridges_disjoint_communities(self):
        pg = planted_kvcc(n_comms=4, comm_size=10, k=4, bridges=2, seed=0)
        for a, b in zip(pg.communities, pg.communities[1:]):
            assert not (a & b)

    def test_each_community_k_connected(self):
        pg = planted_kvcc(n_comms=3, comm_size=9, k=3, overlap=2, extra_chords=2, seed=3)
        g = pg.graph()
        for c in pg.communities:
            assert vertex_connectivity(g.induced(c)) >= 3

    def test_validation(self):
        with pytest.raises(ValueError):
            planted_kvcc(n_comms=2, comm_size=8, k=3, overlap=1, bridges=1)
        with pytest.raises(ValueError):
            planted_kvcc(n_comms=2, comm_size=8, k=3, overlap=3)
        with pytest.raises(ValueError):
            planted_kvcc(n_comms=2, comm_size=6, k=4, overlap=3)

    def test_dense_p_adds_edges(self):
        thin = planted_kvcc(n_comms=2, comm_size=12, k=3, overlap=2, seed=4)
        dense = planted_kvcc(
            n_comms=2, comm_size=12, k=3, overlap=2, dense_p=0.8, seed=4
        )
        assert dense.graph().m > thin.graph().m


class TestChungLu:
    def test_size_and_range(self):
        es = chung_lu(n=200, target_m=400, seed=1)
        g = AdjGraph(es)
        assert 200 <= g.m <= 400  # dedup loses some; capped at target
        assert max(max(e) for e in es) < 200

    def test_deterministic(self):
        assert chung_lu(n=100, target_m=200, seed=5) == chung_lu(
            n=100, target_m=200, seed=5
        )

    def test_hub_weight_creates_hub(self):
        es = chung_lu(n=300, target_m=900, seed=2, hub_weight=100.0)
        g = AdjGraph(es)
        assert g.degree(0) == max(g.degree(v) for v in g.adj)

    def test_skewed_degrees(self):
        es = chung_lu(n=500, target_m=1500, gamma=2.1, seed=3)
        g = AdjGraph(es)
        degs = sorted((g.degree(v) for v in g.adj), reverse=True)
        assert degs[0] > 5 * degs[len(degs) // 2]  # heavy tail


class TestSnapAnalogs:
    def test_all_seven_datasets(self):
        assert set(SNAP_ANALOGS) == {
            "stanford", "dblp", "cnr", "nd", "google", "youtube", "cit",
        }

    @pytest.mark.parametrize("name", list(SNAP_ANALOGS))
    def test_builds_and_deterministic(self, name):
        a = snap_analog(name)
        b = snap_analog(name)
        assert a.edges == b.edges
        s = stats(a.edges)
        assert s["V"] > 500 and s["E"] > s["V"]

    def test_scale_shrinks(self):
        full = stats(snap_analog("dblp").edges)
        half = stats(snap_analog("dblp", scale=0.5).edges)
        assert half["V"] < full["V"] and half["E"] < full["E"]

    def test_paper_stats_recorded(self):
        for spec in SNAP_ANALOGS.values():
            assert {"V", "E", "density", "max_deg"} <= set(spec.paper_stats)

    def test_stats_helper(self):
        s = stats([(0, 1), (1, 2)])
        assert s == {"V": 3, "E": 2, "density": 0.67, "max_deg": 2}
