"""k-core baseline: connected components of the maximal subgraph with
minimum degree >= k (paper §2.2, Figs. 7-9 comparison model)."""
from __future__ import annotations

from repro.graph.local import AdjGraph


def kcore_components_local(g: AdjGraph, k: int) -> list[set[int]]:
    """Connected k-core subgraphs, sorted by smallest member id."""
    core = g.k_core(k)
    return sorted(
        core.connected_components(), key=lambda s: (min(s), len(s), sorted(s))
    )
