"""Even–Tarjan directed flow graph for vertex connectivity (paper §4.1).

Every vertex ``x`` of G becomes an arc ``x_in -> x_out`` of capacity 1;
every undirected edge (u, v) becomes ``u_out -> v_in`` and ``v_out ->
u_in``. The max flow from ``u_out`` to ``v_in`` equals the local vertex
connectivity κ(u, v, G) for non-adjacent u, v (Menger).

Deviation from the paper's prose, documented: the paper sets *all*
capacities to 1. We give adjacency arcs capacity ``k`` instead. This does
not change any flow value that matters (the algorithm only distinguishes
flow < k from flow >= k, and a set of <= k vertex-disjoint paths each uses
an adjacency arc at most once), but it guarantees that when the flow is
< k every crossing arc of the residual min cut is a *vertex* arc, so the
vertex cut falls straight out of residual reachability — no edge-to-vertex
cut mapping heuristics needed (paper Alg. 2 line 17).
"""
from __future__ import annotations

from repro.flow.maxflow import FlowNetwork
from repro.graph.local import AdjGraph


class VertexFlowGraph:
    """Reusable split-graph network for all LOC-CUT tests on one graph.

    ``local_cut(u, v)`` implements paper Alg. 2's LOC-CUT: returns ``None``
    when κ(u, v) >= k (including the adjacent / identical shortcut of
    Lemma 5), otherwise a minimum u-v vertex cut of size < k.
    """

    def __init__(self, graph: AdjGraph, k: int) -> None:
        self.graph = graph
        self.k = k
        verts = graph.vertices()
        self._idx = {v: i for i, v in enumerate(verts)}
        self._verts = verts
        net = FlowNetwork(2 * len(verts))
        # Vertex arcs: in-node 2i -> out-node 2i+1, capacity 1.
        for v in verts:
            i = self._idx[v]
            net.add_edge(2 * i, 2 * i + 1, 1)
        # Adjacency arcs, capacity k (see module docstring).
        for u, v in graph.edges():
            iu, iv = self._idx[u], self._idx[v]
            net.add_edge(2 * iu + 1, 2 * iv, k)
            net.add_edge(2 * iv + 1, 2 * iu, k)
        self.net = net

    def _in(self, v: int) -> int:
        return 2 * self._idx[v]

    def _out(self, v: int) -> int:
        return 2 * self._idx[v] + 1

    def connectivity(self, u: int, v: int) -> int:
        """κ(u, v) capped at k, for non-adjacent distinct u, v."""
        self.net.reset()
        return self.net.max_flow(self._out(u), self._in(v), self.k)

    def local_cut(self, u: int, v: int) -> set[int] | None:
        """Paper's LOC-CUT: ``None`` iff u ≡_k v, else a min u-v vertex cut.

        Adjacent or identical pairs return ``None`` immediately (Lemma 5).
        """
        if u == v or self.graph.has_edge(u, v):
            return None
        self.net.reset()
        flow = self.net.max_flow(self._out(u), self._in(v), self.k)
        if flow >= self.k:
            return None
        reach = self.net.reachable_from(self._out(u))
        cut = {
            x
            for x in self._verts
            if x != u and x != v and self._in(x) in reach and self._out(x) not in reach
        }
        # Unit vertex arcs + capacity-k adjacency arcs guarantee the min
        # cut is exactly `flow` vertex arcs; anything else is a bug.
        assert len(cut) == flow, (len(cut), flow)
        return cut
