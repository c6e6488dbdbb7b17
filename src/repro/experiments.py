"""Experiment harness reproducing each table/figure of the evaluation
section (paper §6). Shared by ``jobs/`` (spark-submit entrypoints) and
``benchmarks/`` (pytest-benchmark targets); every function returns the
rows the paper reports so EXPERIMENTS.md can diff paper vs measured.

Scaling note (DESIGN.md §3): datasets are ~1/100-scale synthetic analogs,
and the paper's k range 20-40 maps to 8-16 here (10-14 for the
effectiveness study — the k's above the analogs' community-separator
sizes, where the three models actually differentiate).
"""
from __future__ import annotations

import time
import tracemalloc
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.baselines.kcore_baseline import kcore_components_local
from repro.baselines.kecc import kecc_local
from repro.core.global_cut import CutCounters
from repro.core.kvcc_enum import kvcc_enumerate
from repro.core.kvcc_local import VARIANTS, kvcc_enum_local
from repro.graph.df_graph import edges_from_pandas
from repro.graph.generators import SNAP_ANALOGS, snap_analog, stats
from repro.graph.local import AdjGraph
from repro.graph.metrics import subgraph_metrics_local

#: scaled stand-ins for the paper's k = 20..40 sweep
EFFICIENCY_KS = (8, 12, 16)
#: k range where the analogs' models separate (community separators are
#: 5-10 vertices/edges, so k must exceed them; the paper's real graphs
#: separate at smaller k)
EFFECTIVENESS_KS = (10, 12, 14)
#: the four datasets the paper picks as effectiveness representatives
EFFECTIVENESS_DATASETS = ("youtube", "dblp", "google", "cnr")
#: Table 2's column set (the paper's table omits youtube)
TABLE2_DATASETS = ("stanford", "dblp", "nd", "google", "cit", "cnr")


def _analog_graph(name: str, scale: float = 1.0) -> AdjGraph:
    return snap_analog(name, scale=scale).graph()


# -- Table 1 ---------------------------------------------------------------

def table1_network_stats() -> pd.DataFrame:
    """Our analogs' |V|, |E|, density, max degree next to the paper's."""
    rows = []
    for name, spec in SNAP_ANALOGS.items():
        s = stats(snap_analog(name).edges)
        rows.append(
            {
                "dataset": name,
                "V": s["V"],
                "E": s["E"],
                "density": s["density"],
                "max_deg": s["max_deg"],
                "paper_V": spec.paper_stats["V"],
                "paper_E": spec.paper_stats["E"],
                "paper_density": spec.paper_stats["density"],
                "paper_max_deg": spec.paper_stats["max_deg"],
            }
        )
    return pd.DataFrame(rows)


# -- Table 2 ---------------------------------------------------------------

def table2_sweep_rules(
    datasets=TABLE2_DATASETS, ks=EFFICIENCY_KS, scale: float = 1.0
) -> pd.DataFrame:
    """NS_1 / NS_2 / GS / Non-Pru proportions of phase-1 vertices in
    VCCE*, averaged over k (the paper averages over k = 20..40)."""
    rows = []
    for name in datasets:
        g = _analog_graph(name, scale)
        acc = {"NS_1": 0.0, "NS_2": 0.0, "GS": 0.0, "Non-Pru": 0.0}
        for k in ks:
            counters = CutCounters()
            kvcc_enum_local(g, k, variant="vcce-star", counters=counters)
            for key, val in counters.proportions().items():
                acc[key] += val / len(ks)
        rows.append({"dataset": name, **{k: round(v, 3) for k, v in acc.items()}})
    return pd.DataFrame(rows)


# -- Fig. 7-9 (effectiveness, reported as a table) ------------------------

def effectiveness_metrics(
    datasets=EFFECTIVENESS_DATASETS, ks=EFFECTIVENESS_KS, scale: float = 1.0
) -> pd.DataFrame:
    """Average diameter / edge density / clustering coefficient of all
    k-VCCs vs k-ECCs vs k-cores (paper Figs. 7, 8, 9)."""
    rows = []
    for name in datasets:
        g = _analog_graph(name, scale)
        for k in ks:
            for model, fn in (
                ("k-VCC", lambda: kvcc_enum_local(g, k)),
                ("k-ECC", lambda: kecc_local(g, k)),
                ("k-core", lambda: kcore_components_local(g, k)),
            ):
                comps = fn()
                if not comps:
                    rows.append(
                        {
                            "dataset": name, "k": k, "model": model,
                            "count": 0, "diameter": None, "density": None,
                            "clustering": None,
                        }
                    )
                    continue
                ms = [subgraph_metrics_local(g.induced(c)) for c in comps]
                rows.append(
                    {
                        "dataset": name,
                        "k": k,
                        "model": model,
                        "count": len(comps),
                        "diameter": round(sum(x["diameter"] for x in ms) / len(ms), 2),
                        "density": round(sum(x["density"] for x in ms) / len(ms), 3),
                        "clustering": round(sum(x["clustering"] for x in ms) / len(ms), 3),
                    }
                )
    return pd.DataFrame(rows)


# -- Fig. 10 (processing time) --------------------------------------------

def processing_time(
    datasets=tuple(SNAP_ANALOGS),
    ks=EFFICIENCY_KS,
    variants=tuple(VARIANTS),
    scale: float = 1.0,
) -> pd.DataFrame:
    """Wall time and LOC-CUT counts per variant (paper Fig. 10). LOC-CUT
    counts are the hardware-independent view of the same comparison."""
    rows = []
    for name in datasets:
        g = _analog_graph(name, scale)
        for k in ks:
            for variant in variants:
                counters = CutCounters()
                t0 = time.perf_counter()
                res = kvcc_enum_local(g, k, variant=variant, counters=counters)
                rows.append(
                    {
                        "dataset": name,
                        "k": k,
                        "variant": variant,
                        "seconds": round(time.perf_counter() - t0, 3),
                        "loc_cut_calls": counters.loc_cut_calls,
                        "n_vccs": len(res),
                    }
                )
    return pd.DataFrame(rows)


# -- Fig. 11 (number of k-VCCs) -------------------------------------------

def kvcc_counts(
    spark: SparkSession | None,
    datasets=tuple(SNAP_ANALOGS),
    ks=EFFICIENCY_KS,
) -> pd.DataFrame:
    """#k-VCCs per dataset and k (paper Fig. 11). With a SparkSession the
    distributed kernel-mode pipeline runs; without, the local kernel."""
    rows = []
    for name in datasets:
        if spark is not None:
            edges = edges_from_pandas(spark, snap_analog(name).edges)
        g = None if spark is not None else _analog_graph(name)
        for k in ks:
            if spark is not None:
                n = (
                    kvcc_enumerate(spark, edges, k)
                    .select("vcc_id")
                    .distinct()
                    .count()
                )
            else:
                n = len(kvcc_enum_local(g, k))
            rows.append({"dataset": name, "k": k, "n_vccs": n})
    return pd.DataFrame(rows)


# -- Fig. 12 (memory usage) ------------------------------------------------

def memory_usage(datasets=tuple(SNAP_ANALOGS), ks=EFFICIENCY_KS) -> pd.DataFrame:
    """Peak Python heap of the VCCE* kernel (tracemalloc), our stand-in
    for the paper's process RSS (DESIGN.md substitution 4)."""
    rows = []
    for name in datasets:
        edges = snap_analog(name).edges
        for k in ks:
            g = AdjGraph(edges)
            tracemalloc.start()
            kvcc_enum_local(g, k)
            _, peak = tracemalloc.get_traced_memory()
            tracemalloc.stop()
            rows.append(
                {"dataset": name, "k": k, "peak_mb": round(peak / 2**20, 2)}
            )
    return pd.DataFrame(rows)


# -- Fig. 13 (scalability) -------------------------------------------------

@dataclass
class _Sample:
    frac: float
    graph: AdjGraph


def _vertex_samples(g: AdjGraph, fracs, seed: int = 0) -> list[_Sample]:
    import numpy as np

    rng = np.random.default_rng(seed)
    verts = g.vertices()
    perm = rng.permutation(len(verts))
    return [
        _Sample(f, g.induced({verts[i] for i in perm[: int(len(verts) * f)]}))
        for f in fracs
    ]


def _edge_samples(g: AdjGraph, fracs, seed: int = 0) -> list[_Sample]:
    import numpy as np

    rng = np.random.default_rng(seed)
    edges = g.edges()
    perm = rng.permutation(len(edges))
    return [
        _Sample(f, AdjGraph(edges[i] for i in perm[: int(len(edges) * f)]))
        for f in fracs
    ]


def scalability(
    datasets=("google", "cit"),
    ks=(12,),
    fracs=(0.2, 0.4, 0.6, 0.8, 1.0),
    variants=tuple(VARIANTS),
) -> pd.DataFrame:
    """Time vs sampled |V| and |E| (paper Fig. 13): vertex sampling keeps
    the induced subgraph; edge sampling keeps incident vertices."""
    rows = []
    for name in datasets:
        g = _analog_graph(name)
        for axis, samples in (
            ("V", _vertex_samples(g, fracs)),
            ("E", _edge_samples(g, fracs)),
        ):
            for s in samples:
                for k in ks:
                    for variant in variants:
                        t0 = time.perf_counter()
                        res = kvcc_enum_local(s.graph, k, variant=variant)
                        rows.append(
                            {
                                "dataset": name,
                                "axis": axis,
                                "frac": s.frac,
                                "k": k,
                                "variant": variant,
                                "seconds": round(time.perf_counter() - t0, 3),
                                "n_vccs": len(res),
                            }
                        )
    return pd.DataFrame(rows)
