"""k-edge-connected components (k-ECC) baseline.

The paper compares k-VCC against k-ECC [Zhou et al., EDBT'12; Chang et
al., SIGMOD'13]. We implement the cut-based decomposition those works
share: recursively find a global min *edge* cut; if its value is < k,
remove the cut edges and recurse on the pieces, else the piece is a k-ECC.

Global min edge cut uses the classic fixed-source reduction: for a fixed
source s, the edge connectivity of G equals min over v != s of the s-v max
flow in the bidirected unit-capacity graph — so one pass of flow tests per
component suffices (no vertex-splitting, no second phase; this is why
vertex connectivity is the harder problem the paper is about). Degree
peeling (κ' <= δ, Whitney) prunes first, exactly like KVCC-ENUM's k-core
step.
"""
from __future__ import annotations

from repro.flow.maxflow import FlowNetwork
from repro.graph.local import AdjGraph


class EdgeFlowGraph:
    """Bidirected unit-capacity network over a graph's own vertices, for
    s-t edge connectivity (capped at k) and min edge cut extraction."""

    def __init__(self, graph: AdjGraph, k: int) -> None:
        self.graph = graph
        self.k = k
        verts = graph.vertices()
        self._idx = {v: i for i, v in enumerate(verts)}
        self._verts = verts
        net = FlowNetwork(len(verts))
        for u, v in graph.edges():
            net.add_edge(self._idx[u], self._idx[v], 1)
            net.add_edge(self._idx[v], self._idx[u], 1)
        self.net = net

    def local_edge_cut(self, s: int, t: int) -> list[tuple[int, int]] | None:
        """``None`` if λ(s, t) >= k, else a minimum s-t edge cut (< k
        edges) as undirected vertex pairs."""
        self.net.reset()
        flow = self.net.max_flow(self._idx[s], self._idx[t], self.k)
        if flow >= self.k:
            return None
        reach = self.net.reachable_from(self._idx[s])
        cut = [
            (u, v)
            for u, v in self.graph.edges()
            if (self._idx[u] in reach) != (self._idx[v] in reach)
        ]
        assert 0 < len(cut) < self.k, (len(cut), flow)
        return cut


def global_edge_cut(
    g: AdjGraph, k: int, *, use_certificate: bool = True
) -> list[tuple[int, int]] | None:
    """An edge cut with < k edges, or ``None`` if λ(G) >= k.

    Fixed-source sweep: λ(G) = min_{v != s} λ(s, v) for any s. The cheap
    screening flows run on a spanning-forest-decomposition certificate
    (Nagamochi–Ibaraki: the union of k successive spanning forests
    preserves all edge-connectivity values up to k); when a violating pair
    is found, the actual cut is recomputed on ``g`` itself, since a min
    cut of the certificate need not be an edge cut of ``g``.
    """
    from repro.core.sparse_cert import sparse_certificate

    cert = sparse_certificate(g, k)[0] if use_certificate else g
    screen = EdgeFlowGraph(cert, k)
    full: EdgeFlowGraph | None = None if use_certificate else screen
    verts = g.vertices()
    s = verts[0]
    for v in verts[1:]:
        screen.net.reset()
        lam = screen.net.max_flow(screen._idx[s], screen._idx[v], k)
        if lam >= k:
            continue
        if full is None:
            full = EdgeFlowGraph(g, k)
        cut = full.local_edge_cut(s, v)
        if cut is not None:
            return cut
        # Certificate said < k but the real graph disagrees: the NI
        # certificate property was violated (should be impossible).
        # Fall back to a full sweep without the certificate.
        return global_edge_cut(g, k, use_certificate=False)
    return None


def kecc_local(g: AdjGraph, k: int) -> list[set[int]]:
    """All k-ECCs of ``g`` (maximal subgraphs with edge connectivity >= k,
    at least 2 vertices), sorted by smallest member."""
    if k < 1:
        raise ValueError("k must be >= 1")
    results: list[set[int]] = []
    stack: list[AdjGraph] = [g]
    while stack:
        cur = stack.pop().k_core(k)  # κ' <= δ: safe pruning
        if cur.n == 0:
            continue
        for comp in cur.connected_components():
            sub = cur.induced(comp)
            if sub.n < 2:
                continue
            cut = global_edge_cut(sub, k)
            if cut is None:
                results.append(set(comp))
            else:
                rest = sub.without_edges(cut)
                for part in rest.connected_components():
                    stack.append(rest.induced(part))
    return sorted(results, key=lambda s: (min(s), len(s), sorted(s)))
