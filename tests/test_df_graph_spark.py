"""Spark tests for DataFrame graph operators, oracle-checked in DuckDB
wherever the result is a plain query."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph.df_graph import (
    canonical_edges,
    degrees,
    edges_from_pandas,
    induced_subgraph,
    remove_vertices,
    symmetrize,
    to_local,
    vertices,
)
from repro.oracle import assert_equivalent
from tests.helpers import clique_edges, cycle_edges


@pytest.fixture(scope="module")
def edges(spark):
    raw = pd.DataFrame(
        {
            "src": [1, 2, 2, 3, 3, 1, 5, 5],
            "dst": [2, 1, 3, 2, 1, 1, 6, 5],  # dupes, reverse dupes, loop
        }
    )
    return canonical_edges(spark.createDataFrame(raw)).cache()


class TestCanonical:
    def test_dedup_and_loops(self, edges):
        pdf = edges.toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
        assert list(map(tuple, pdf[["src", "dst"]].values)) == [
            (1, 2),
            (1, 3),
            (2, 3),
            (5, 6),
        ]

    def test_gid_added(self, edges):
        assert set(edges.toPandas().gid) == {0}

    def test_gid_preserved(self, spark):
        raw = spark.createDataFrame(
            pd.DataFrame({"gid": [7, 7], "src": [1, 2], "dst": [2, 3]})
        )
        assert set(canonical_edges(raw).toPandas().gid) == {7}

    def test_oracle_canonicalization(self, spark):
        raw = pd.DataFrame({"src": [4, 2, 2, 9], "dst": [1, 5, 5, 9]})
        got = canonical_edges(spark.createDataFrame(raw))
        assert_equivalent(
            got,
            """
            SELECT DISTINCT 0::BIGINT AS gid,
                   LEAST(src, dst)::BIGINT AS src,
                   GREATEST(src, dst)::BIGINT AS dst
            FROM raw WHERE src != dst
            """,
            raw=raw,
        )


class TestDegrees:
    def test_oracle_degrees(self, spark):
        raw = pd.DataFrame(clique_edges(range(5)) + cycle_edges(4, offset=10), columns=["src", "dst"])
        e = canonical_edges(spark.createDataFrame(raw))
        assert_equivalent(
            degrees(e),
            """
            WITH canon AS (
              SELECT DISTINCT LEAST(src,dst) AS src, GREATEST(src,dst) AS dst
              FROM raw WHERE src != dst
            ), sym AS (
              SELECT src AS v FROM canon UNION ALL SELECT dst AS v FROM canon
            )
            SELECT 0::BIGINT AS gid, v::BIGINT AS vertex, COUNT(*)::BIGINT AS degree
            FROM sym GROUP BY v
            """,
            raw=raw,
        )

    def test_clique_degrees(self, spark):
        e = edges_from_pandas(spark, clique_edges(range(6)))
        pdf = degrees(e).toPandas()
        assert set(pdf.degree) == {5} and len(pdf) == 6


class TestSubgraphOps:
    def test_symmetrize_doubles(self, edges):
        assert symmetrize(edges).count() == 2 * edges.count()

    def test_vertices(self, edges):
        assert sorted(vertices(edges).toPandas().vertex) == [1, 2, 3, 5, 6]

    def test_induced(self, spark, edges):
        keep = spark.createDataFrame(
            pd.DataFrame({"gid": [0, 0, 0], "vertex": [1, 2, 3]})
        )
        sub = induced_subgraph(edges, keep).toPandas()
        assert len(sub) == 3  # triangle only; (5,6) dropped

    def test_remove_vertices(self, spark, edges):
        drop = spark.createDataFrame(pd.DataFrame({"gid": [0], "vertex": [1]}))
        rest = remove_vertices(edges, drop).toPandas()
        assert sorted(map(tuple, rest[["src", "dst"]].values)) == [(2, 3), (5, 6)]

    def test_to_local_roundtrip(self, spark):
        es = clique_edges(range(4))
        g = to_local(edges_from_pandas(spark, es))
        assert g.edges() == sorted(es)
