"""Spark connected components vs local reference and a DuckDB
recursive-CTE oracle."""
import pandas as pd
import pytest

from repro.graph.components import connected_components
from repro.graph.df_graph import canonical_edges, edges_from_pandas
from repro.oracle import assert_equivalent
from tests.helpers import clique_edges, cycle_edges, path_edges, random_graph


def _local_cc(g):
    out = {}
    for comp in g.connected_components():
        root = min(comp)
        for v in comp:
            out[v] = root
    return out


def test_single_component(spark_small_shuffle):
    spark = spark_small_shuffle
    e = edges_from_pandas(spark, cycle_edges(8))
    pdf = connected_components(e).toPandas()
    assert set(pdf.comp) == {0}


def test_multiple_components(spark_small_shuffle):
    spark = spark_small_shuffle
    es = clique_edges(range(4)) + cycle_edges(3, offset=10) + path_edges(3, offset=20)
    e = edges_from_pandas(spark, es)
    pdf = connected_components(e).toPandas()
    got = dict(zip(pdf.vertex, pdf.comp))
    from repro.graph.local import AdjGraph

    assert got == _local_cc(AdjGraph(es))


@pytest.mark.parametrize("seed", [1, 2, 3])
def test_matches_local_on_random(spark_small_shuffle, seed):
    spark = spark_small_shuffle
    g = random_graph(seed * 1000, 10, 16)
    e = edges_from_pandas(spark, g.edges())
    pdf = connected_components(e).toPandas()
    got = dict(zip(pdf.vertex, pdf.comp))
    want = _local_cc(g)
    # DF version only sees vertices with incident edges
    want = {v: c for v, c in want.items() if g.degree(v) > 0}
    assert got == want


def test_long_path_converges(spark_small_shuffle):
    # pointer jumping must beat the diameter bound comfortably
    spark = spark_small_shuffle
    e = edges_from_pandas(spark, path_edges(40))
    pdf = connected_components(e, max_iter=20).toPandas()
    assert set(pdf.comp) == {0} and len(pdf) == 40


def test_multi_gid_namespaced(spark_small_shuffle):
    spark = spark_small_shuffle
    a = pd.DataFrame(cycle_edges(3), columns=["src", "dst"]).assign(gid=1)
    b = pd.DataFrame(cycle_edges(3), columns=["src", "dst"]).assign(gid=2)
    e = canonical_edges(spark.createDataFrame(pd.concat([a, b])))
    pdf = connected_components(e).toPandas()
    assert len(pdf) == 6
    assert set(pdf.gid) == {1, 2}


def test_oracle_recursive_cte(spark_small_shuffle):
    spark = spark_small_shuffle
    es = clique_edges(range(4)) + path_edges(4, offset=6) + [(20, 21)]
    raw = pd.DataFrame(es, columns=["src", "dst"])
    e = edges_from_pandas(spark, raw)
    got = connected_components(e).select("vertex", "comp")
    assert_equivalent(
        got,
        """
        WITH RECURSIVE sym AS (
          SELECT src AS a, dst AS b FROM raw
          UNION SELECT dst, src FROM raw
        ), verts AS (
          SELECT DISTINCT a AS v FROM sym
        ), reach(v, r) AS (
          SELECT v, v FROM verts
          UNION
          SELECT sym.b, reach.r FROM reach JOIN sym ON sym.a = reach.v
        )
        SELECT v::BIGINT AS vertex, MIN(r)::BIGINT AS comp
        FROM reach GROUP BY v
        """,
        raw=raw,
    )
