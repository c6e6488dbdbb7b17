"""Tests for the provided TPC-H-lite generators (oracle-checked) and the
graph dataset extension."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestTpchLite:
    def test_lineitem_oracle_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("cnt"),
                F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, COUNT(*)::BIGINT AS cnt,
                   ROUND(SUM(l_quantity), 2) AS sum_qty
            FROM li GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_join_oracle(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, COUNT(*)::BIGINT AS cnt
            FROM li JOIN o ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            o=o,
        )

    def test_determinism(self, spark):
        a = synth_data.customer(spark, sf=0.001).toPandas()
        b = synth_data.customer(spark, sf=0.001).toPandas()
        assert a.equals(b)


class TestGraphEdges:
    def test_loads_canonical(self, spark):
        e = synth_data.graph_edges(spark, name="youtube", scale=0.4)
        pdf = e.toPandas()
        assert set(pdf.columns) == {"gid", "src", "dst"}
        assert (pdf.src < pdf.dst).all()
        assert len(pdf) > 100

    def test_matches_generator(self, spark):
        from repro.graph.generators import snap_analog

        pdf = (
            synth_data.graph_edges(spark, name="dblp", scale=0.3)
            .orderBy("src", "dst")
            .toPandas()
        )
        want = snap_analog("dblp", scale=0.3).edges
        assert list(map(tuple, pdf[["src", "dst"]].values)) == want

    def test_unknown_dataset(self, spark):
        with pytest.raises(KeyError):
            synth_data.graph_edges(spark, name="nope")
