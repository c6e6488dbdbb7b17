"""Distributed KVCC-ENUM (kernel + BSP modes) vs the local kernel and
planted ground truth."""
import pandas as pd
import pytest

from repro.core.kvcc_enum import kvcc_enumerate
from repro.core.kvcc_local import kvcc_enum_local
from repro.graph.df_graph import edges_from_pandas
from repro.graph.generators import planted_kvcc, snap_analog
from repro.graph.local import AdjGraph
from tests.helpers import clique_edges, paper_fig2_graph, sorted_sets


def _membership_sets(df) -> list[list[int]]:
    pdf = df.toPandas()
    return sorted_sets(set(grp.vertex) for _, grp in pdf.groupby("vcc_id"))


@pytest.mark.parametrize("mode", ["kernel", "bsp"])
class TestBothModes:
    def test_paper_fig2(self, spark_small_shuffle, mode):
        spark = spark_small_shuffle
        g, truth = paper_fig2_graph()
        e = edges_from_pandas(spark, g.edges())
        got = _membership_sets(kvcc_enumerate(spark, e, 3, mode=mode))
        assert got == sorted_sets(truth)

    def test_planted_overlap(self, spark_small_shuffle, mode):
        spark = spark_small_shuffle
        pg = planted_kvcc(n_comms=3, comm_size=12, k=4, overlap=2, extra_chords=4, seed=5)
        e = edges_from_pandas(spark, pg.edges)
        got = _membership_sets(kvcc_enumerate(spark, e, 4, mode=mode))
        assert got == sorted_sets(pg.communities)

    def test_planted_bridges(self, spark_small_shuffle, mode):
        spark = spark_small_shuffle
        pg = planted_kvcc(n_comms=3, comm_size=10, k=3, bridges=2, seed=6)
        e = edges_from_pandas(spark, pg.edges)
        got = _membership_sets(kvcc_enumerate(spark, e, 3, mode=mode))
        assert got == sorted_sets(pg.communities)

    def test_empty_after_kcore(self, spark_small_shuffle, mode):
        spark = spark_small_shuffle
        from tests.helpers import path_edges

        e = edges_from_pandas(spark, path_edges(8))
        out = kvcc_enumerate(spark, e, 3, mode=mode)
        assert out.count() == 0

    def test_matches_local_kernel(self, spark_small_shuffle, mode):
        spark = spark_small_shuffle
        from tests.helpers import random_graph

        g = random_graph(777, 14, 20)
        e = edges_from_pandas(spark, g.edges())
        got = _membership_sets(kvcc_enumerate(spark, e, 3, mode=mode))
        want = sorted_sets(kvcc_enum_local(g, 3))
        assert got == want


class TestKernelModeOnAnalog:
    def test_analog_dataset(self, spark_small_shuffle):
        spark = spark_small_shuffle
        pg = snap_analog("youtube", scale=0.6)
        e = edges_from_pandas(spark, pg.edges)
        got = _membership_sets(kvcc_enumerate(spark, e, 10))
        want = sorted_sets(kvcc_enum_local(AdjGraph(pg.edges), 10))
        assert got == want
        assert len(got) > 0

    def test_variant_parameter(self, spark_small_shuffle):
        spark = spark_small_shuffle
        g, truth = paper_fig2_graph()
        e = edges_from_pandas(spark, g.edges())
        for variant in ("vcce", "vcce-star"):
            got = _membership_sets(
                kvcc_enumerate(spark, e, 3, variant=variant)
            )
            assert got == sorted_sets(truth)

    def test_bad_args(self, spark):
        e = edges_from_pandas(spark, clique_edges(range(4)))
        with pytest.raises(ValueError):
            kvcc_enumerate(spark, e, 2, mode="nope")
        with pytest.raises(ValueError):
            kvcc_enumerate(spark, e, 2, variant="nope")

    def test_overlap_membership_rows(self, spark_small_shuffle):
        # overlapping vertices appear once per containing k-VCC
        spark = spark_small_shuffle
        g, _ = paper_fig2_graph()
        e = edges_from_pandas(spark, g.edges())
        pdf = kvcc_enumerate(spark, e, 3).toPandas()
        counts = pdf.groupby("vertex").size()
        assert counts[3] == 2 and counts[4] == 2 and counts[0] == 1
