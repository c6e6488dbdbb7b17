"""Distributed KVCC-ENUM: the paper's recursive partition framework on
Spark DataFrames.

Two execution modes, both returning a membership DataFrame
``(vcc_id: string, vertex: long)``:

- ``mode="kernel"`` (default): one distributed round of bulk pruning —
  k-core peel + connected components in DataFrames — then every component
  is shipped to an executor via ``applyInPandas`` and enumerated to
  completion by the local kernel (``kvcc_enum_local``). Components run in
  parallel across cores; this is the fast path used by the benchmarks.

- ``mode="bsp"``: the recursion itself is distributed. Every round runs
  k-core + CC over *all* pending subgraphs at once (gid-keyed), then each
  component executes exactly one GLOBAL-CUT + OVERLAP-PARTITION inside
  ``applyInPandas``; components certified k-connected retire as k-VCCs,
  split parts re-enter the next round. This mirrors paper Alg. 1
  literally, at the cost of one Spark round per partition depth.

Both modes produce identical results (asserted by tests) and identical
results to the pure-local kernel.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.kvcc_local import VARIANTS, kvcc_enum_local, overlap_partition
from repro.core.global_cut import global_cut
from repro.graph.components import connected_components
from repro.graph.df_graph import DST, GID, SRC, canonical_edges
from repro.graph.kcore import k_core_edges
from repro.graph.local import AdjGraph


def _regroup_by_component(edges: DataFrame) -> DataFrame:
    """Relabel gid so that every connected component of every subgraph
    gets its own dense gid (the GraphX subgraph-extraction analog)."""
    comp = connected_components(edges)
    comp_src = comp.select(
        GID, F.col("vertex").alias(SRC), F.col("comp").alias("comp")
    )
    tagged = edges.join(comp_src, [GID, SRC])
    new_ids = (
        tagged.select(GID, "comp")
        .distinct()
        .withColumn(
            "new_gid",
            F.row_number().over(Window.orderBy(GID, "comp")).cast("long"),
        )
    )
    return (
        tagged.join(new_ids, [GID, "comp"])
        .select(F.col("new_gid").alias(GID), SRC, DST)
    )


def kvcc_enumerate(
    spark: SparkSession,
    edges: DataFrame,
    k: int,
    *,
    variant: str = "vcce-star",
    mode: str = "kernel",
    max_rounds: int = 64,
) -> DataFrame:
    """All k-VCCs of the (gid-ignored, merged) input graph.

    Returns (vcc_id, vertex); vcc_id is an opaque string unique per
    component. Input may be any DataFrame with src/dst columns.
    """
    if variant not in VARIANTS:
        raise ValueError(f"unknown variant {variant!r}")
    edges = canonical_edges(edges)
    if mode == "kernel":
        return _kernel_mode(spark, edges, k, variant)
    if mode == "bsp":
        return _bsp_mode(spark, edges, k, variant, max_rounds)
    raise ValueError(f"unknown mode {mode!r}")


# -- kernel mode -----------------------------------------------------------

_MEMBER_SCHEMA = "vcc_id string, vertex long"


def _kernel_mode(
    spark: SparkSession, edges: DataFrame, k: int, variant: str
) -> DataFrame:
    core = k_core_edges(edges, k)
    if core.isEmpty():
        return spark.createDataFrame([], _MEMBER_SCHEMA)
    grouped = _regroup_by_component(core)

    def enumerate_component(pdf: pd.DataFrame) -> pd.DataFrame:
        gid = int(pdf[GID].iloc[0])
        g = AdjGraph(zip(pdf[SRC].tolist(), pdf[DST].tolist()))
        frames = [
            pd.DataFrame({"vcc_id": f"g{gid}v{i}", "vertex": sorted(vcc)})
            for i, vcc in enumerate(kvcc_enum_local(g, k, variant=variant))
        ]
        if not frames:
            return pd.DataFrame({"vcc_id": pd.Series(dtype="str"), "vertex": pd.Series(dtype="int64")})
        return pd.concat(frames, ignore_index=True)

    return grouped.groupBy(GID).applyInPandas(enumerate_component, _MEMBER_SCHEMA)


# -- bsp mode --------------------------------------------------------------

_STEP_SCHEMA = f"{GID} long, part long, final boolean, {SRC} long, {DST} long"


def _bsp_mode(
    spark: SparkSession,
    edges: DataFrame,
    k: int,
    variant: str,
    max_rounds: int,
) -> DataFrame:
    neighbor_sweep, group_sweep = VARIANTS[variant]
    pending = edges
    final_rows: list[tuple[str, int]] = []

    def cut_step(pdf: pd.DataFrame) -> pd.DataFrame:
        """One GLOBAL-CUT + OVERLAP-PARTITION for one connected,
        k-core-pruned component."""
        gid = int(pdf[GID].iloc[0])
        g = AdjGraph(zip(pdf[SRC].tolist(), pdf[DST].tolist()))
        cut = global_cut(
            g, k, neighbor_sweep=neighbor_sweep, group_sweep=group_sweep
        )
        if cut is None:
            return pd.DataFrame(
                {
                    GID: gid,
                    "part": 0,
                    "final": True,
                    SRC: pdf[SRC],
                    DST: pdf[DST],
                }
            )
        frames = []
        for p, part in enumerate(overlap_partition(g, cut)):
            es = part.edges()
            frames.append(
                pd.DataFrame(
                    {
                        GID: gid,
                        "part": p,
                        "final": False,
                        SRC: [e[0] for e in es],
                        DST: [e[1] for e in es],
                    }
                )
            )
        return pd.concat(frames, ignore_index=True)

    for rnd in range(max_rounds):
        core = k_core_edges(pending, k)
        if core.isEmpty():
            break
        grouped = _regroup_by_component(core)
        stepped = (
            grouped.groupBy(GID)
            .applyInPandas(cut_step, _STEP_SCHEMA)
            .localCheckpoint(eager=True)
        )
        finals = stepped.where("final")
        if not finals.isEmpty():
            pdf = finals.toPandas()
            for gid, grp in pdf.groupby(GID):
                members = set(grp[SRC].tolist()) | set(grp[DST].tolist())
                vcc_id = f"r{rnd}g{int(gid)}"
                final_rows.extend((vcc_id, int(v)) for v in sorted(members))
        pending = stepped.where(~F.col("final")).select(
            # Recombine (gid, part) into a fresh unique gid for next round.
            (F.col(GID) * 4096 + F.col("part")).alias(GID),
            SRC,
            DST,
        )
        if pending.isEmpty():
            break
    else:
        raise RuntimeError(f"BSP mode did not finish in {max_rounds} rounds")
    return spark.createDataFrame(
        pd.DataFrame(final_rows, columns=["vcc_id", "vertex"])
        if final_rows
        else pd.DataFrame({"vcc_id": pd.Series(dtype="str"), "vertex": pd.Series(dtype="int64")}),
        _MEMBER_SCHEMA,
    )
