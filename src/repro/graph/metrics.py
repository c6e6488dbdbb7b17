"""Cohesiveness metrics for the effectiveness study (paper §6.1, Eq. 1-6):
diameter, edge density and clustering coefficient of each detected
subgraph (k-VCC / k-ECC / k-core).

The DataFrame implementations are pure joins/aggregations (so the DuckDB
oracle can validate them); diameter needs per-subgraph BFS and runs as an
``applyInPandas`` kernel over the membership grouping.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.df_graph import DST, GID, SRC
from repro.graph.local import AdjGraph

SET_ID = "set_id"


# -- local versions (per-subgraph, used by kernels and tests) -------------

def diameter_local(g: AdjGraph) -> int:
    """Exact diameter (longest shortest path); BFS from every vertex.
    Assumes a connected graph (components hand these in)."""
    best = 0
    for v in g.adj:
        dist = g.bfs_dist(v)
        ecc = max(dist.values())
        if ecc > best:
            best = ecc
    return best


def edge_density_local(g: AdjGraph) -> float:
    """Paper Eq. 4: 2|E| / (|V|(|V|-1))."""
    if g.n < 2:
        return 0.0
    return 2.0 * g.m / (g.n * (g.n - 1))


def clustering_coefficient_local(g: AdjGraph) -> float:
    """Paper Eq. 5-6: average local clustering coefficient; vertices of
    degree < 2 contribute 0 (the usual convention for the undefined
    ratio)."""
    if g.n == 0:
        return 0.0
    total = 0.0
    for u, nbrs in g.adj.items():
        d = len(nbrs)
        if d < 2:
            continue
        ns = sorted(nbrs)
        links = 0
        for i, a in enumerate(ns):
            adj_a = g.adj[a]
            for b in ns[i + 1 :]:
                if b in adj_a:
                    links += 1
        total += 2.0 * links / (d * (d - 1))
    return total / g.n


def subgraph_metrics_local(g: AdjGraph) -> dict[str, float]:
    return {
        "n": g.n,
        "m": g.m,
        "diameter": diameter_local(g),
        "density": edge_density_local(g),
        "clustering": clustering_coefficient_local(g),
    }


# -- DataFrame versions ---------------------------------------------------

def member_edges(edges: DataFrame, members: DataFrame) -> DataFrame:
    """Edges of each member-set's induced subgraph: (set_id, src, dst).

    ``edges``: canonical (gid-less or gid=0) edges. ``members``:
    (set_id, vertex). Sets may overlap — each edge is tagged once per set
    containing both endpoints.
    """
    m_src = members.select(SET_ID, F.col("vertex").alias(SRC))
    m_dst = members.select(SET_ID, F.col("vertex").alias(DST))
    return (
        edges.select(SRC, DST)
        .join(m_src, SRC)
        .join(m_dst, [SET_ID, DST])
        .select(SET_ID, SRC, DST)
    )


def density_df(edges: DataFrame, members: DataFrame) -> DataFrame:
    """(set_id, n, m, density) per member set — paper Eq. 4."""
    me = member_edges(edges, members)
    n = members.groupBy(SET_ID).agg(F.count("*").alias("n"))
    m = me.groupBy(SET_ID).agg(F.count("*").alias("m"))
    return (
        n.join(m, SET_ID, "left")
        .na.fill({"m": 0})
        .select(
            SET_ID,
            "n",
            "m",
            (2.0 * F.col("m") / (F.col("n") * (F.col("n") - 1))).alias("density"),
        )
    )


def clustering_df(edges: DataFrame, members: DataFrame) -> DataFrame:
    """(set_id, clustering) per member set — paper Eq. 5-6, via wedge and
    triangle joins (all SQL-expressible; oracle-checked in tests)."""
    me = member_edges(edges, members)
    sym = me.unionByName(
        me.select(SET_ID, F.col(DST).alias(SRC), F.col(SRC).alias(DST))
    )
    deg = sym.groupBy(SET_ID, F.col(SRC).alias("v")).agg(
        F.count("*").alias("d")
    )
    # Wedges centered at c: neighbors a < b; closed iff (a, b) is an edge.
    n1 = sym.select(SET_ID, F.col(SRC).alias("c"), F.col(DST).alias("a"))
    n2 = sym.select(SET_ID, F.col(SRC).alias("c"), F.col(DST).alias("b"))
    wedges = n1.join(n2, [SET_ID, "c"]).where(F.col("a") < F.col("b"))
    closed = wedges.join(
        me.select(SET_ID, F.col(SRC).alias("a"), F.col(DST).alias("b")),
        [SET_ID, "a", "b"],
        "left_semi",
    )
    tri = closed.groupBy(SET_ID, F.col("c").alias("v")).agg(
        F.count("*").alias("tri")
    )
    per_vertex = (
        deg.join(tri, [SET_ID, "v"], "left")
        .na.fill({"tri": 0})
        .select(
            SET_ID,
            F.when(
                F.col("d") >= 2,
                2.0 * F.col("tri") / (F.col("d") * (F.col("d") - 1)),
            )
            .otherwise(0.0)
            .alias("c_u"),
        )
    )
    return per_vertex.groupBy(SET_ID).agg(F.avg("c_u").alias("clustering"))


def diameter_df(edges: DataFrame, members: DataFrame) -> DataFrame:
    """(set_id, diameter) per member set, exact BFS per subgraph kernel."""
    me = member_edges(edges, members)

    def diam(pdf: pd.DataFrame) -> pd.DataFrame:
        sid = pdf[SET_ID].iloc[0]
        g = AdjGraph(zip(pdf[SRC].tolist(), pdf[DST].tolist()))
        return pd.DataFrame({SET_ID: [sid], "diameter": [diameter_local(g)]})

    return me.groupBy(SET_ID).applyInPandas(
        diam, f"{SET_ID} string, diameter long"
    )
