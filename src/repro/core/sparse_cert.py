"""Sparse certificate via scan-first search (paper §4.2, Thm. 5) and
side-groups (paper §5.2, Thm. 10).

A sparse certificate of G for k-vertex connectivity is the union of k
scan-first-search forests F_1..F_k, where F_i is a spanning forest of
G_{i-1} = G minus the edges of F_1..F_{i-1} (Cheriyan–Kao–Thurimella). It
has <= k(n-1) edges and preserves every local connectivity value up to k,
so all LOC-CUT flow tests run on it instead of G.

BFS is a valid scan-first search (paper §4.2: "a breadth first search is a
special case of scan first search"), and we use it with sorted tie-breaks
for determinism.

Side-groups are the connected components of the *last* forest F_k with
more than k vertices: by paper Lemma 18 / Thm. 10 any two vertices in the
same F_k component are k-locally-connected, which powers the group sweep.
"""
from __future__ import annotations

from collections import deque

from repro.graph.local import AdjGraph

Edge = tuple[int, int]


def scan_first_forest(remaining: dict[int, set[int]]) -> list[Edge]:
    """One scan-first (BFS) spanning forest of the graph given as an
    adjacency dict. Returns tree edges (parent, child); does not mutate
    ``remaining``."""
    forest: list[Edge] = []
    marked: set[int] = set()
    for root in sorted(remaining):
        if root in marked:
            continue
        marked.add(root)
        queue = deque([root])
        while queue:
            x = queue.popleft()
            for w in sorted(remaining[x]):
                if w not in marked:
                    marked.add(w)
                    forest.append((x, w))
                    queue.append(w)
    return forest


def sparse_certificate(g: AdjGraph, k: int) -> tuple[AdjGraph, list[list[Edge]]]:
    """Compute (certificate graph, [F_1, ..., F_k]) for ``g``.

    The certificate keeps g's full vertex set (isolated vertices possible
    only if g had them) and at most k(n-1) edges.
    """
    remaining = {v: set(nbrs) for v, nbrs in g.adj.items()}
    forests: list[list[Edge]] = []
    cert = AdjGraph(vertices=g.adj)
    for _ in range(k):
        forest = scan_first_forest(remaining)
        for a, b in forest:
            remaining[a].discard(b)
            remaining[b].discard(a)
            cert.add_edge(a, b)
        forests.append(forest)
        if not forest:  # graph exhausted early; later forests are empty
            break
    while len(forests) < k:
        forests.append([])
    return cert, forests


def side_groups(forests: list[list[Edge]], k: int) -> list[set[int]]:
    """Connected components of F_k with more than k vertices (paper
    Alg. 3 line 1: only groups that can ever be swept are kept)."""
    fk = AdjGraph(forests[k - 1]) if forests and forests[k - 1] else AdjGraph()
    return [cc for cc in fk.connected_components() if len(cc) > k]
