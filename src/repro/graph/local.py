"""Local adjacency-set graph used by the per-component enumeration kernels.

``AdjGraph`` is an undirected simple graph over integer vertex ids. It is
the representation every local kernel (GLOBAL-CUT, sparse certificate,
max-flow, k-ECC baseline) operates on; components handed to kernels are
small after k-core pruning, so a dict-of-sets is the right trade-off.

All iteration orders are deterministic (sorted) so the whole reproduction
is seed-stable.
"""
from __future__ import annotations

from collections import deque
from collections.abc import Iterable


class AdjGraph:
    """Undirected simple graph backed by ``dict[int, set[int]]``.

    Self-loops are dropped on insertion; parallel edges collapse. Vertices
    may be isolated (present with an empty neighbor set).
    """

    __slots__ = ("adj",)

    def __init__(
        self,
        edges: Iterable[tuple[int, int]] = (),
        vertices: Iterable[int] = (),
    ) -> None:
        self.adj: dict[int, set[int]] = {}
        for v in vertices:
            self.adj.setdefault(int(v), set())
        for u, v in edges:
            self.add_edge(int(u), int(v))

    # -- construction ------------------------------------------------------

    def add_edge(self, u: int, v: int) -> None:
        """Insert undirected edge (u, v); no-op for self-loops."""
        if u == v:
            return
        self.adj.setdefault(u, set()).add(v)
        self.adj.setdefault(v, set()).add(u)

    def copy(self) -> "AdjGraph":
        g = AdjGraph()
        g.adj = {v: set(nbrs) for v, nbrs in self.adj.items()}
        return g

    # -- basic accessors ---------------------------------------------------

    @property
    def n(self) -> int:
        """Number of vertices."""
        return len(self.adj)

    @property
    def m(self) -> int:
        """Number of (undirected) edges."""
        return sum(len(nbrs) for nbrs in self.adj.values()) // 2

    def vertices(self) -> list[int]:
        """All vertex ids, sorted (deterministic iteration order)."""
        return sorted(self.adj)

    def neighbors(self, v: int) -> set[int]:
        return self.adj[v]

    def degree(self, v: int) -> int:
        return len(self.adj[v])

    def has_edge(self, u: int, v: int) -> bool:
        return u in self.adj and v in self.adj[u]

    def edges(self) -> list[tuple[int, int]]:
        """Canonical (u < v) edge list, sorted."""
        return sorted(
            (u, v) for u, nbrs in self.adj.items() for v in nbrs if u < v
        )

    def min_degree_vertex(self) -> int:
        """Vertex of minimum degree (ties broken by smallest id)."""
        return min(self.adj, key=lambda v: (len(self.adj[v]), v))

    # -- subgraphs ---------------------------------------------------------

    def induced(self, vs: Iterable[int]) -> "AdjGraph":
        """Vertex-induced subgraph ``G[vs]``."""
        keep = set(vs)
        g = AdjGraph()
        g.adj = {v: self.adj[v] & keep for v in keep if v in self.adj}
        return g

    def without_vertices(self, vs: Iterable[int]) -> "AdjGraph":
        """Copy of the graph with ``vs`` and their incident edges removed."""
        drop = set(vs)
        return self.induced(set(self.adj) - drop)

    def without_edges(self, es: Iterable[tuple[int, int]]) -> "AdjGraph":
        """Copy of the graph with the given undirected edges removed."""
        g = self.copy()
        for u, v in es:
            if u in g.adj:
                g.adj[u].discard(v)
            if v in g.adj:
                g.adj[v].discard(u)
        return g

    # -- traversal ---------------------------------------------------------

    def connected_components(self) -> list[set[int]]:
        """Components as vertex sets, ordered by smallest member id."""
        seen: set[int] = set()
        comps: list[set[int]] = []
        for root in sorted(self.adj):
            if root in seen:
                continue
            comp = {root}
            queue = deque([root])
            while queue:
                x = queue.popleft()
                for w in self.adj[x]:
                    if w not in comp:
                        comp.add(w)
                        queue.append(w)
            seen |= comp
            comps.append(comp)
        return comps

    def is_connected(self) -> bool:
        return self.n <= 1 or len(self.connected_components()) == 1

    def bfs_dist(self, src: int) -> dict[int, int]:
        """Unweighted shortest-path distance from ``src`` to every
        reachable vertex (``src`` included at distance 0)."""
        dist = {src: 0}
        queue = deque([src])
        while queue:
            x = queue.popleft()
            dx = dist[x]
            for w in self.adj[x]:
                if w not in dist:
                    dist[w] = dx + 1
                    queue.append(w)
        return dist

    # -- k-core ------------------------------------------------------------

    def k_core(self, k: int) -> "AdjGraph":
        """Maximal subgraph with minimum degree >= k (may be empty).

        Classic peeling: repeatedly delete vertices of degree < k; a
        worklist makes it O(n + m).
        """
        deg = {v: len(nbrs) for v, nbrs in self.adj.items()}
        queue = deque(v for v, d in deg.items() if d < k)
        dead: set[int] = set(queue)
        while queue:
            x = queue.popleft()
            for w in self.adj[x]:
                if w in dead:
                    continue
                deg[w] -= 1
                if deg[w] < k:
                    dead.add(w)
                    queue.append(w)
        return self.without_vertices(dead) if dead else self.copy()

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"AdjGraph(n={self.n}, m={self.m})"
