"""Distributed connected components (paper Alg. 1 line 3) — the GraphX
``connectedComponents`` analog, in DataFrames.

Hash-min label propagation with pointer jumping: each round every vertex
takes the min label over {itself} U neighbors (propagation), then labels
chase their own label's label (path halving). The combination converges
in O(log n) rounds on typical graphs instead of O(diameter).

Labels are vertex ids, so the component id is the minimum vertex id of the
component — deterministic, join-stable, and namespaced per gid.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.df_graph import DST, GID, SRC, symmetrize, vertices


def connected_components(
    edges: DataFrame, *, max_iter: int = 60, checkpoint_every: int = 3
) -> DataFrame:
    """(gid, vertex, comp) for every vertex incident to an edge; ``comp``
    is the min vertex id in the component (within its gid)."""
    sym = symmetrize(edges).localCheckpoint(eager=True)
    labels = vertices(edges).withColumn("comp", F.col("vertex"))
    for it in range(max_iter):
        # Propagation: min over neighbors' labels.
        nbr_min = (
            sym.join(
                labels.select(GID, F.col("vertex").alias(DST), "comp"),
                [GID, DST],
            )
            .groupBy(GID, F.col(SRC).alias("vertex"))
            .agg(F.min("comp").alias("nbr_comp"))
        )
        new = (
            labels.join(nbr_min, [GID, "vertex"], "left")
            .select(
                GID,
                "vertex",
                F.least(
                    F.col("comp"), F.coalesce(F.col("nbr_comp"), F.col("comp"))
                ).alias("comp"),
            )
        )
        # Pointer jumping: comp <- comp's comp.
        parent = new.select(
            GID, F.col("vertex").alias("comp"), F.col("comp").alias("comp2")
        )
        new = (
            new.join(parent, [GID, "comp"], "left")
            .select(
                GID,
                "vertex",
                F.least(F.col("comp"), F.coalesce(F.col("comp2"), F.col("comp"))).alias(
                    "comp"
                ),
            )
        )
        if (it + 1) % checkpoint_every == 0:
            new = new.localCheckpoint(eager=True)
        changed = (
            new.alias("n")
            .join(labels.alias("o"), [GID, "vertex"])
            .where(F.col("n.comp") != F.col("o.comp"))
        )
        done = changed.isEmpty()
        labels = new
        if done:
            return labels.localCheckpoint(eager=True)
    raise RuntimeError(f"connected components did not converge in {max_iter} rounds")
