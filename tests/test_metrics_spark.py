"""Spark metric DataFrames vs DuckDB oracle and local reference."""
import math

import pandas as pd
import pytest

from repro.graph.df_graph import edges_from_pandas
from repro.graph.local import AdjGraph
from repro.graph.metrics import (
    clustering_coefficient_local,
    clustering_df,
    density_df,
    diameter_df,
    diameter_local,
    member_edges,
)
from repro.oracle import assert_equivalent
from tests.helpers import clique_edges, cycle_edges, paper_fig2_graph


@pytest.fixture(scope="module")
def fig2(spark):
    g, truth = paper_fig2_graph()
    raw = pd.DataFrame(g.edges(), columns=["src", "dst"])
    edges = spark.createDataFrame(raw).cache()
    members = spark.createDataFrame(
        pd.DataFrame(
            [("a", v) for v in sorted(truth[0])] + [("b", v) for v in sorted(truth[1])],
            columns=["set_id", "vertex"],
        )
    ).cache()
    return g, truth, raw, edges, members


class TestMemberEdges:
    def test_oracle(self, fig2):
        g, truth, raw, edges, members = fig2
        mem_pdf = members.toPandas()
        assert_equivalent(
            member_edges(edges, members),
            """
            SELECT m1.set_id AS set_id, e.src AS src, e.dst AS dst
            FROM raw e
            JOIN mem m1 ON m1.vertex = e.src
            JOIN mem m2 ON m2.vertex = e.dst AND m2.set_id = m1.set_id
            """,
            raw=raw,
            mem=mem_pdf,
        )

    def test_overlap_edge_in_both(self, fig2):
        _, _, _, edges, members = fig2
        me = member_edges(edges, members).toPandas()
        both = me[(me.src == 3) & (me.dst == 4)]
        assert set(both.set_id) == {"a", "b"}


class TestDensity:
    def test_oracle(self, fig2):
        g, truth, raw, edges, members = fig2
        assert_equivalent(
            density_df(edges, members),
            """
            WITH me AS (
              SELECT m1.set_id, e.src, e.dst FROM raw e
              JOIN mem m1 ON m1.vertex = e.src
              JOIN mem m2 ON m2.vertex = e.dst AND m2.set_id = m1.set_id
            ), n AS (SELECT set_id, COUNT(*)::BIGINT AS n FROM mem GROUP BY set_id),
            m AS (SELECT set_id, COUNT(*)::BIGINT AS m FROM me GROUP BY set_id)
            SELECT n.set_id AS set_id, n.n AS n, COALESCE(m.m, 0) AS m,
                   2.0 * COALESCE(m.m, 0) / (n.n * (n.n - 1)) AS density
            FROM n LEFT JOIN m ON n.set_id = m.set_id
            """,
            raw=raw,
            mem=members.toPandas(),
        )

    def test_clique_density_one(self, fig2):
        _, _, _, edges, members = fig2
        pdf = density_df(edges, members).toPandas()
        assert all(math.isclose(d, 1.0) for d in pdf.density)  # both K5s


class TestClustering:
    def test_matches_local(self, fig2):
        g, truth, _, edges, members = fig2
        pdf = clustering_df(edges, members).toPandas().set_index("set_id")
        for sid, comm in (("a", truth[0]), ("b", truth[1])):
            want = clustering_coefficient_local(g.induced(comm))
            assert math.isclose(pdf.loc[sid, "clustering"], want)

    def test_oracle_triangle_free(self, spark):
        raw = pd.DataFrame(cycle_edges(6), columns=["src", "dst"])
        edges = spark.createDataFrame(raw)
        mem = pd.DataFrame([("s", v) for v in range(6)], columns=["set_id", "vertex"])
        members = spark.createDataFrame(mem)
        pdf = clustering_df(edges, members).toPandas()
        assert pdf.clustering.tolist() == [0.0]

    def test_oracle_sql(self, spark):
        g = AdjGraph(clique_edges(range(4)) + [(3, 9), (9, 2)])
        raw = pd.DataFrame(g.edges(), columns=["src", "dst"])
        edges = spark.createDataFrame(raw)
        mem = pd.DataFrame(
            [("s", v) for v in g.vertices()], columns=["set_id", "vertex"]
        )
        members = spark.createDataFrame(mem)
        assert_equivalent(
            clustering_df(edges, members),
            """
            WITH me AS (
              SELECT m1.set_id, e.src, e.dst FROM raw e
              JOIN mem m1 ON m1.vertex = e.src
              JOIN mem m2 ON m2.vertex = e.dst AND m2.set_id = m1.set_id
            ), sym AS (
              SELECT set_id, src, dst FROM me
              UNION ALL SELECT set_id, dst, src FROM me
            ), deg AS (
              SELECT set_id, src AS v, COUNT(*)::BIGINT AS d
              FROM sym GROUP BY set_id, src
            ), tri AS (
              SELECT n1.set_id, n1.src AS v, COUNT(*)::BIGINT AS t
              FROM sym n1
              JOIN sym n2 ON n2.set_id = n1.set_id AND n2.src = n1.src
                         AND n1.dst < n2.dst
              JOIN me e ON e.set_id = n1.set_id AND e.src = n1.dst
                       AND e.dst = n2.dst
              GROUP BY n1.set_id, n1.src
            )
            SELECT deg.set_id AS set_id,
                   AVG(CASE WHEN deg.d >= 2
                            THEN 2.0 * COALESCE(tri.t, 0) / (deg.d * (deg.d - 1))
                            ELSE 0.0 END) AS clustering
            FROM deg LEFT JOIN tri ON tri.set_id = deg.set_id AND tri.v = deg.v
            GROUP BY deg.set_id
            """,
            raw=raw,
            mem=mem,
        )


class TestDiameter:
    def test_matches_local(self, fig2):
        g, truth, _, edges, members = fig2
        pdf = diameter_df(edges, members).toPandas().set_index("set_id")
        for sid, comm in (("a", truth[0]), ("b", truth[1])):
            assert pdf.loc[sid, "diameter"] == diameter_local(g.induced(comm))

    def test_cycle(self, spark):
        raw = pd.DataFrame(cycle_edges(8), columns=["src", "dst"])
        members = spark.createDataFrame(
            pd.DataFrame([("s", v) for v in range(8)], columns=["set_id", "vertex"])
        )
        pdf = diameter_df(spark.createDataFrame(raw), members).toPandas()
        assert pdf.diameter.tolist() == [4]
