"""GLOBAL-CUT and GLOBAL-CUT* (paper Alg. 2 and Alg. 3).

Given a connected graph G (already k-core-pruned) and k, find a vertex cut
S with |S| < k, or certify that G is k-vertex-connected (return ``None``).

Phase 1 tests the local connectivity of a source u against every other
vertex (covers "u not in any small cut"); phase 2 tests all pairs of u's
neighbors (covers "u in every small cut", paper Lemma 4). All flow tests
run on the sparse certificate; the optimized variant sweeps vertices via
``SweepContext`` and processes phase-1 vertices farthest-first.

Defensive verification: the cut comes from flows on the certificate. By
the Cheriyan–Kao–Thurimella certificate property it is also a cut of G;
we still verify (cheap BFS) and, if that ever failed, recompute with flows
directly on G (counted in ``CutCounters.fallbacks`` — expected 0).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations

from repro.core.sparse_cert import side_groups, sparse_certificate
from repro.core.sweeps import (
    GS,
    NS1,
    NS2,
    SOURCE,
    TESTED,
    SweepContext,
    strong_side_vertices,
)
from repro.flow.flow_graph import VertexFlowGraph
from repro.graph.local import AdjGraph


@dataclass
class CutCounters:
    """Run-wide instrumentation. ``pruned``/``tested``/``source`` count
    phase-1 loop vertices by outcome (the paper's Table 2 universe);
    ``loc_cut_calls`` counts flow tests across both phases."""

    loc_cut_calls: int = 0
    tested: int = 0
    source: int = 0
    pruned: dict[str, int] = field(
        default_factory=lambda: {NS1: 0, NS2: 0, GS: 0}
    )
    phase2_pairs: int = 0
    phase2_skipped_same_group: int = 0
    global_cut_calls: int = 0
    partitions: int = 0
    fallbacks: int = 0

    def phase1_total(self) -> int:
        return self.tested + self.source + sum(self.pruned.values())

    def proportions(self) -> dict[str, float]:
        """Table 2 row: NS_1 / NS_2 / GS / Non-Pru fractions of phase-1
        vertices. The source vertex is never flow-tested but was not swept
        by a rule either; the paper folds it into the non-pruned bucket."""
        total = self.phase1_total()
        if total == 0:
            return {"NS_1": 0.0, "NS_2": 0.0, "GS": 0.0, "Non-Pru": 0.0}
        return {
            "NS_1": self.pruned[NS1] / total,
            "NS_2": self.pruned[NS2] / total,
            "GS": self.pruned[GS] / total,
            "Non-Pru": (self.tested + self.source) / total,
        }


def _verified(g: AdjGraph, cut: set[int]) -> bool:
    """Does removing ``cut`` disconnect ``g``?"""
    rest = g.without_vertices(cut)
    return rest.n > 0 and not rest.is_connected()


def global_cut(
    g: AdjGraph,
    k: int,
    *,
    neighbor_sweep: bool = True,
    group_sweep: bool = True,
    counters: CutCounters | None = None,
    use_certificate: bool = True,
) -> set[int] | None:
    """Find a vertex cut of size < k, or ``None`` if g is k-connected.

    ``neighbor_sweep=False, group_sweep=False`` gives the paper's basic
    GLOBAL-CUT (Alg. 2): min-degree source, id order, no sweeping. Any
    sweep enabled gives the GLOBAL-CUT* (Alg. 3) skeleton with only that
    strategy's rules active.
    """
    counters = counters if counters is not None else CutCounters()
    counters.global_cut_calls += 1
    optimized = neighbor_sweep or group_sweep

    if use_certificate:
        cert, forests = sparse_certificate(g, k)
    else:
        cert, forests = g, []
    flow = VertexFlowGraph(cert, k)
    groups = side_groups(forests, k) if (group_sweep and forests) else []
    # Strong side-vertices (computed on the certificate, Alg. 3 line 3).
    # Both optimized variants need them: NS rule 1 directly, GS rule 1 via
    # side-groups containing a strong side-vertex.
    ssv = strong_side_vertices(cert, k) if optimized else set()

    if optimized and ssv:
        source = min(ssv)  # deterministic stand-in for "randomly select"
    else:
        source = cert.min_degree_vertex()

    ctx = (
        SweepContext(
            cert, k, ssv, groups, enable_ns=neighbor_sweep, enable_gs=group_sweep
        )
        if optimized
        else None
    )
    if ctx is not None:
        ctx.sweep(source, SOURCE)

    if optimized:
        dist = cert.bfs_dist(source)
        order = sorted(cert.adj, key=lambda v: (-dist.get(v, 0), v))
    else:
        order = cert.vertices()

    def _finalize(cut: set[int]) -> set[int] | None:
        # `cut` disconnects the certificate; per the certificate property
        # it must disconnect g too. Verify; fall back to flows on g if not.
        assert 0 < len(cut) < k
        if _verified(g, cut):
            return cut
        counters.fallbacks += 1
        return global_cut(
            g,
            k,
            neighbor_sweep=neighbor_sweep,
            group_sweep=group_sweep,
            counters=counters,
            use_certificate=False,
        )

    # -- Phase 1: source vs everyone --------------------------------------
    for v in order:
        if ctx is not None and ctx.pru[v]:
            rule = ctx.rule.get(v, TESTED)
            if rule in counters.pruned:
                counters.pruned[rule] += 1
            else:
                counters.source += 1
            continue
        if v == source:
            counters.source += 1
            continue
        counters.loc_cut_calls += 1
        cut = flow.local_cut(source, v)
        counters.tested += 1
        if cut:
            return _finalize(cut)
        if ctx is not None:
            ctx.sweep(v, TESTED)

    # -- Phase 2: pairs of the source's neighbors (Lemma 4) ---------------
    if source not in ssv:
        for va, vb in combinations(sorted(cert.adj[source]), 2):
            if ctx is not None and ctx.same_group(va, vb):
                counters.phase2_skipped_same_group += 1
                continue
            counters.phase2_pairs += 1
            counters.loc_cut_calls += 1
            cut = flow.local_cut(va, vb)
            if cut:
                return _finalize(cut)

    return None
