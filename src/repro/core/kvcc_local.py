"""KVCC-ENUM (paper Alg. 1) as a local kernel over ``AdjGraph``.

The recursion is expressed as an explicit worklist: pop a graph, peel to
its k-core, split into connected components, and for each component either
certify it as a k-VCC (GLOBAL-CUT finds no small cut) or OVERLAP-PARTITION
it and push the parts back. Termination: every part is strictly smaller
than its parent (paper Lemma 8-10 bound the work by O(n) partitions).

This kernel is what `repro.core.kvcc_enum` ships to executors via
``applyInPandas``; it is also directly usable on the driver for the
instrumented Table-2 runs.
"""
from __future__ import annotations

from repro.core.global_cut import CutCounters, global_cut
from repro.graph.local import AdjGraph

#: variant name -> (neighbor_sweep, group_sweep); the paper's four
#: algorithms from §6.2.
VARIANTS: dict[str, tuple[bool, bool]] = {
    "vcce": (False, False),
    "vcce-n": (True, False),
    "vcce-g": (False, True),
    "vcce-star": (True, True),
}


def overlap_partition(g: AdjGraph, cut: set[int]) -> list[AdjGraph]:
    """Paper Alg. 1's OVERLAP-PARTITION: remove the cut, then return each
    remaining component with the cut (and its induced edges) duplicated
    back in."""
    rest = g.without_vertices(cut)
    return [g.induced(comp | cut) for comp in rest.connected_components()]


def kvcc_enum_local(
    g: AdjGraph,
    k: int,
    *,
    variant: str = "vcce-star",
    counters: CutCounters | None = None,
) -> list[set[int]]:
    """All k-VCCs of ``g`` as vertex sets, sorted by smallest member.

    ``variant`` selects which sweep strategies GLOBAL-CUT uses; every
    variant returns identical results (sweeps are sound), which the test
    suite asserts.
    """
    if k < 1:
        raise ValueError("k must be >= 1")
    neighbor_sweep, group_sweep = VARIANTS[variant]
    results: list[set[int]] = []
    stack: list[AdjGraph] = [g]
    while stack:
        cur = stack.pop().k_core(k)
        if cur.n == 0:
            continue
        for comp in cur.connected_components():
            sub = cur.induced(comp)
            if sub.n <= k:
                # Cannot satisfy |V| > k (unreachable after k-core, kept as
                # a guard for k=0-style edge cases).
                continue
            cut = global_cut(
                sub,
                k,
                neighbor_sweep=neighbor_sweep,
                group_sweep=group_sweep,
                counters=counters,
            )
            if cut is None:
                results.append(set(comp))
            else:
                if counters is not None:
                    counters.partitions += 1
                stack.extend(overlap_partition(sub, cut))
    return sorted(results, key=lambda s: (min(s), len(s), sorted(s)))
