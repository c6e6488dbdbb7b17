"""Integer max-flow with early exit at a target value.

The paper's LOC-CUT needs, per vertex pair, (a) the max-flow value capped
at ``k`` — once k augmenting paths exist, local connectivity is >= k and
the test stops (paper §4.3) — and (b) for flows < k, the residual
reachability set to extract a minimum cut.

Edmonds–Karp (BFS augmenting paths) on an array-based adjacency structure:
with unit vertex capacities the flow value is bounded by k, so a test
costs at most k+1 BFS passes, i.e. O(k·m) — matching the paper's
``O(min(n^1/2, k)·m)`` bound for the k-capped regime it actually runs in.

Networks are reusable: ``reset()`` restores all capacities, so one network
per GLOBAL-CUT call serves every LOC-CUT pair.
"""
from __future__ import annotations

from collections import deque


class FlowNetwork:
    """Directed flow network with integer capacities and paired reverse
    arcs (arc ``i`` and ``i ^ 1`` are a residual pair)."""

    __slots__ = ("n", "head", "to", "cap", "_cap0")

    def __init__(self, n: int) -> None:
        self.n = n
        self.head: list[list[int]] = [[] for _ in range(n)]
        self.to: list[int] = []
        self.cap: list[int] = []
        self._cap0: list[int] = []

    def add_edge(self, u: int, v: int, cap: int) -> int:
        """Add arc u->v with ``cap`` plus its 0-capacity reverse arc.
        Returns the forward arc id."""
        eid = len(self.to)
        self.to.extend((v, u))
        self.cap.extend((cap, 0))
        self._cap0.extend((cap, 0))
        self.head[u].append(eid)
        self.head[v].append(eid + 1)
        return eid

    def reset(self) -> None:
        """Restore every arc to its original capacity (undo all flow)."""
        self.cap[:] = self._cap0

    def max_flow(self, s: int, t: int, limit: int) -> int:
        """Max flow from s to t, stopping early once ``limit`` is reached.

        Returns min(true max flow, limit). BFS finds shortest augmenting
        paths; each augmentation pushes the bottleneck capacity (1 for the
        unit-capacity vertex arcs that dominate here).
        """
        if s == t:
            return limit
        flow = 0
        to, cap, head = self.to, self.cap, self.head
        while flow < limit:
            # BFS for an augmenting path, recording the arc used to reach
            # each node.
            parent_arc = [-1] * self.n
            parent_arc[s] = -2
            queue = deque([s])
            found = False
            while queue and not found:
                x = queue.popleft()
                for eid in head[x]:
                    if cap[eid] > 0 and parent_arc[to[eid]] == -1:
                        parent_arc[to[eid]] = eid
                        if to[eid] == t:
                            found = True
                            break
                        queue.append(to[eid])
            if not found:
                break
            # Bottleneck along the path, then augment.
            bottleneck = limit - flow
            node = t
            while node != s:
                eid = parent_arc[node]
                if cap[eid] < bottleneck:
                    bottleneck = cap[eid]
                node = to[eid ^ 1]
            node = t
            while node != s:
                eid = parent_arc[node]
                cap[eid] -= bottleneck
                cap[eid ^ 1] += bottleneck
                node = to[eid ^ 1]
            flow += bottleneck
        return flow

    def reachable_from(self, s: int) -> set[int]:
        """Nodes reachable from ``s`` in the residual network (call after
        ``max_flow``; defines the source side of a minimum cut)."""
        seen = {s}
        queue = deque([s])
        to, cap, head = self.to, self.cap, self.head
        while queue:
            x = queue.popleft()
            for eid in head[x]:
                if cap[eid] > 0 and to[eid] not in seen:
                    seen.add(to[eid])
                    queue.append(to[eid])
        return seen
