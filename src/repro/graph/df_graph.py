"""DataFrame operators over undirected graphs.

Convention: a graph (or a keyed family of graphs) is a DataFrame with
columns ``(gid: long, src: long, dst: long)`` — canonical form has
``src < dst``, no duplicates, no self-loops. ``gid`` keys independent
subgraphs so one Catalyst plan processes every pending subgraph of the
recursion at once.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graph.local import AdjGraph

GID, SRC, DST = "gid", "src", "dst"


def canonical_edges(df: DataFrame, src: str = SRC, dst: str = DST) -> DataFrame:
    """Canonicalize to (gid, src<dst) with dedup and self-loop removal;
    adds ``gid = 0`` if absent."""
    cols = df.columns
    out = df
    if GID not in cols:
        out = out.withColumn(GID, F.lit(0).cast("long"))
    out = out.select(
        F.col(GID).cast("long").alias(GID),
        F.least(F.col(src), F.col(dst)).cast("long").alias(SRC),
        F.greatest(F.col(src), F.col(dst)).cast("long").alias(DST),
    )
    return out.where(F.col(SRC) != F.col(DST)).distinct()


def symmetrize(edges: DataFrame) -> DataFrame:
    """Both directions of every canonical edge: (gid, src, dst) U (gid,
    dst, src) — the adjacency-list view used by degree/CC propagation."""
    return edges.unionByName(
        edges.select(GID, F.col(DST).alias(SRC), F.col(SRC).alias(DST))
    )


def degrees(edges: DataFrame) -> DataFrame:
    """Per-vertex degree: (gid, vertex, degree)."""
    return (
        symmetrize(edges)
        .groupBy(GID, F.col(SRC).alias("vertex"))
        .agg(F.count("*").alias("degree"))
    )


def vertices(edges: DataFrame) -> DataFrame:
    """Distinct (gid, vertex) incident to at least one edge."""
    return (
        symmetrize(edges).select(GID, F.col(SRC).alias("vertex")).distinct()
    )


def induced_subgraph(edges: DataFrame, keep: DataFrame) -> DataFrame:
    """Edges with *both* endpoints in ``keep`` (columns gid, vertex) —
    the GraphX ``subgraph`` analog."""
    k_src = keep.select(GID, F.col("vertex").alias(SRC))
    k_dst = keep.select(GID, F.col("vertex").alias(DST))
    return edges.join(k_src, [GID, SRC], "left_semi").join(
        k_dst, [GID, DST], "left_semi"
    )


def remove_vertices(edges: DataFrame, drop: DataFrame) -> DataFrame:
    """Edges with *neither* endpoint in ``drop`` (columns gid, vertex)."""
    d_src = drop.select(GID, F.col("vertex").alias(SRC))
    d_dst = drop.select(GID, F.col("vertex").alias(DST))
    return edges.join(d_src, [GID, SRC], "left_anti").join(
        d_dst, [GID, DST], "left_anti"
    )


def edges_from_pandas(spark: SparkSession, pdf_or_edges, gid: int = 0) -> DataFrame:
    """Lift a local edge list (pairs, or a pandas frame with src/dst) into
    the canonical DataFrame form."""
    if not isinstance(pdf_or_edges, pd.DataFrame):
        pdf_or_edges = pd.DataFrame(pdf_or_edges, columns=[SRC, DST])
    pdf = pdf_or_edges.copy()
    pdf[GID] = gid
    return canonical_edges(spark.createDataFrame(pdf[[GID, SRC, DST]]))


def to_local(edges: DataFrame, gid: int = 0) -> AdjGraph:
    """Collect one keyed subgraph into an ``AdjGraph`` (tests/debug)."""
    pdf = edges.where(F.col(GID) == gid).select(SRC, DST).toPandas()
    return AdjGraph(zip(pdf[SRC].tolist(), pdf[DST].tolist()))
