"""Shared test fixtures/utilities: small named graphs, random graph
builders, and brute-force pairwise connectivity."""
from __future__ import annotations

import random
from itertools import combinations

from repro.graph.local import AdjGraph


def clique_edges(vs) -> list[tuple[int, int]]:
    return [(a, b) for a, b in combinations(sorted(vs), 2)]


def cycle_edges(n: int, offset: int = 0) -> list[tuple[int, int]]:
    return [(offset + i, offset + (i + 1) % n) for i in range(n)]


def path_edges(n: int, offset: int = 0) -> list[tuple[int, int]]:
    return [(offset + i, offset + i + 1) for i in range(n - 1)]


def paper_fig2_graph() -> tuple[AdjGraph, list[set[int]]]:
    """Two overlapping 3-VCCs sharing a 2-vertex cut (paper Fig. 2
    shape): K5 on {0..4} and K5 on {3..7}; the cut is {3, 4}."""
    g = AdjGraph(clique_edges(range(5)) + clique_edges(range(3, 8)))
    return g, [set(range(5)), set(range(3, 8))]


def random_graph(seed: int, n_lo: int = 4, n_hi: int = 9) -> AdjGraph:
    """Seed-deterministic G(n, p) over a random n and p — the workhorse
    for property tests against the brute-force oracle."""
    rng = random.Random(seed)
    n = rng.randint(n_lo, n_hi)
    p = rng.uniform(0.25, 0.95)
    edges = [(a, b) for a, b in combinations(range(n), 2) if rng.random() < p]
    return AdjGraph(edges, vertices=range(n))


def brute_pair_connectivity(g: AdjGraph, u: int, v: int) -> int:
    """κ(u, v): size of a minimum u-v vertex cut by subset enumeration;
    large sentinel (n) when none exists (adjacent pairs)."""
    if g.has_edge(u, v):
        return g.n  # no cut exists
    others = [x for x in g.vertices() if x not in (u, v)]
    for size in range(len(others) + 1):
        for sub in combinations(others, size):
            rest = g.without_vertices(sub)
            if u in rest.adj and v in rest.adj:
                dist = rest.bfs_dist(u)
                if v not in dist:
                    return size
    return g.n


def sorted_sets(sets) -> list[list[int]]:
    return sorted((sorted(s) for s in sets), key=lambda s: (s[0], len(s), s))
