"""Exponential brute-force oracles for tiny graphs (testing only).

Used by the test-suite (including hypothesis property tests) to validate
the flow-based connectivity tester and the full enumeration on graphs
small enough (n <= ~10) for subset enumeration.
"""
from __future__ import annotations

from itertools import combinations

from repro.graph.local import AdjGraph


def vertex_connectivity(g: AdjGraph) -> int:
    """κ(G) by trying every removal set, smallest first (Def. 1).

    Complete graph K_n has no cut; by convention κ(K_n) = n - 1.
    """
    verts = g.vertices()
    n = len(verts)
    if n <= 1:
        return 0
    if not g.is_connected():
        return 0
    for size in range(n - 1):
        for sub in combinations(verts, size):
            rest = g.without_vertices(sub)
            if rest.n > 0 and not rest.is_connected():
                return size
    return n - 1


def is_k_connected(g: AdjGraph, k: int) -> bool:
    """Paper Def. 2: |V| > k and κ(G) >= k."""
    return g.n > k and vertex_connectivity(g) >= k


def brute_kvccs(g: AdjGraph, k: int) -> list[set[int]]:
    """All k-VCCs by checking every vertex subset (Def. 3). Exponential —
    keep n small."""
    verts = g.vertices()
    k_conn: list[set[int]] = []
    for size in range(k + 1, len(verts) + 1):
        for sub in combinations(verts, size):
            cand = g.induced(sub)
            if is_k_connected(cand, k):
                k_conn.append(set(sub))
    maximal = [
        s
        for s in k_conn
        if not any(s < t for t in k_conn)
    ]
    return sorted(maximal, key=lambda s: (min(s), len(s), sorted(s)))
