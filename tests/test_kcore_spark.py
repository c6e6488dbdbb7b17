"""Spark k-core peeling vs the local reference implementation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph.df_graph import edges_from_pandas, to_local
from repro.graph.kcore import k_core_edges
from tests.helpers import clique_edges, path_edges, random_graph


@pytest.mark.parametrize("k", [2, 3])
def test_matches_local_reference(spark_small_shuffle, k):
    spark = spark_small_shuffle
    g = random_graph(42 + k, 12, 18)
    e = edges_from_pandas(spark, g.edges())
    got = to_local(k_core_edges(e, k))
    want = g.k_core(k)
    # local k_core keeps isolated-vertex bookkeeping; edge DFs cannot,
    # so compare edge sets (equal on graphs with min degree >= k >= 1)
    assert got.edges() == want.edges()


def test_cascade_peeling(spark_small_shuffle):
    spark = spark_small_shuffle
    # clique + tail: the tail peels over several rounds
    es = clique_edges(range(4)) + path_edges(5, offset=3)
    e = edges_from_pandas(spark, es)
    got = to_local(k_core_edges(e, 3))
    assert got.edges() == clique_edges(range(4))


def test_empty_result(spark_small_shuffle):
    spark = spark_small_shuffle
    e = edges_from_pandas(spark, path_edges(6))
    assert k_core_edges(e, 2).isEmpty()


def test_multi_gid_independent(spark_small_shuffle):
    spark = spark_small_shuffle
    a = pd.DataFrame(clique_edges(range(4)), columns=["src", "dst"]).assign(gid=1)
    b = pd.DataFrame(path_edges(5), columns=["src", "dst"]).assign(gid=2)
    from repro.graph.df_graph import canonical_edges

    e = canonical_edges(spark.createDataFrame(pd.concat([a, b])))
    out = k_core_edges(e, 2).toPandas()
    assert set(out.gid) == {1}  # the path dissolves, the clique stays
    assert len(out) == 6
