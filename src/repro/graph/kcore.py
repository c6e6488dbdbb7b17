"""Distributed k-core (paper Alg. 1 line 2) as an iterative DataFrame
peeling loop.

Each round removes *every* vertex currently below degree k (parallel
peeling), which converges to the same fixpoint as one-at-a-time removal.
``localCheckpoint`` truncates the join lineage so long cascades do not
blow up the plan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.df_graph import GID, degrees, remove_vertices


def k_core_edges(
    edges: DataFrame, k: int, *, checkpoint_every: int = 4, max_iter: int = 200
) -> DataFrame:
    """Edges of the k-core of every gid-keyed subgraph (possibly empty).

    The result is checkpointed (lineage-free) so callers can loop on it.
    """
    cur = edges.localCheckpoint(eager=True)
    for it in range(max_iter):
        deg = degrees(cur)
        bad = deg.where(F.col("degree") < k).select(GID, "vertex")
        if bad.isEmpty():
            return cur
        cur = remove_vertices(cur, bad)
        if (it + 1) % checkpoint_every == 0:
            cur = cur.localCheckpoint(eager=True)
    # A simple graph peels in <= n rounds; hitting this means max_iter was
    # set far too low for the input.
    raise RuntimeError(f"k-core did not converge in {max_iter} iterations")
