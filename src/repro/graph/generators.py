"""Synthetic graph generators.

The paper evaluates on 7 SNAP graphs; this container has no network, so we
build deterministic synthetic analogs (see DESIGN.md §3.1):

- ``harary(n, k)``: the classic Harary graph H(k, n) — provably exactly
  k-vertex-connected with ceil(kn/2) edges. The building block for planted
  k-VCCs with *known* connectivity.
- ``planted_kvcc(...)``: a chain of Harary-core communities that overlap in
  fewer than k vertices (or are joined by fewer than k bridge edges), so
  the exact k-VCC set is known by construction — the enumeration tests'
  ground truth.
- ``chung_lu(...)``: power-law expected-degree background mimicking
  web/social degree distributions.
- ``snap_analog(name)``: per-dataset presets combining planted communities,
  a Chung–Lu background and forced hubs, scaled ~1/100 of the originals,
  matched on density / max-degree shape (Table 1).

All generators are pure functions of their seed.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.graph.local import AdjGraph

Edge = tuple[int, int]


def harary(n: int, k: int, offset: int = 0) -> list[Edge]:
    """Harary graph H(k, n) on vertices offset..offset+n-1: exactly
    k-vertex-connected (κ = k) with minimum edge count.

    Standard construction (Harary 1962):
    - k even: circulant, each i joined to i±1..k/2;
    - k odd, n even: circulant ±1..(k-1)/2 plus all diameters i ~ i+n/2;
    - k odd, n odd: circulant ±1..(k-1)/2 plus (0, (n-1)/2), (0, (n+1)/2)
      and (i, i+(n+1)/2) for 1 <= i < (n-1)/2.
    """
    if not 0 < k < n:
        raise ValueError(f"need 0 < k < n, got k={k}, n={n}")
    edges: set[Edge] = set()

    def add(a: int, b: int) -> None:
        a, b = a % n, b % n
        if a != b:
            edges.add((min(a, b) + offset, max(a, b) + offset))

    half = k // 2
    for i in range(n):
        for j in range(1, half + 1):
            add(i, i + j)
    if k % 2 == 1:
        if n % 2 == 0:
            for i in range(n // 2):
                add(i, i + n // 2)
        else:
            add(0, (n - 1) // 2)
            add(0, (n + 1) // 2)
            for i in range(1, (n - 1) // 2):
                add(i, i + (n + 1) // 2)
    return sorted(edges)


@dataclass
class PlantedGraph:
    """A generated graph plus its known k-VCC ground truth."""

    edges: list[Edge]
    communities: list[set[int]]
    k: int  #: every community is >= k-vertex-connected; separators are < k

    def graph(self) -> AdjGraph:
        return AdjGraph(self.edges)


def planted_kvcc(
    *,
    n_comms: int,
    comm_size: int,
    k: int,
    overlap: int = 0,
    bridges: int = 0,
    extra_chords: int = 0,
    dense_p: float = 0.0,
    dense_frac: float = 1.0,
    k_per_comm: list[int] | None = None,
    seed: int = 0,
) -> PlantedGraph:
    """Chain of ``n_comms`` communities, each a Harary H(k, comm_size) core
    plus ``extra_chords`` random internal chords and, with probability
    ``dense_p`` per vertex pair, extra clique-like fill-in (dense
    neighborhoods are what make strong side-vertices exist — web graphs
    have them, pure circulants do not).

    Consecutive communities either share ``overlap`` vertices (the paper's
    G1/G2 pattern — the shared set is a vertex cut of size < k) or are
    joined by ``bridges`` independent edges (< k). Exactly one of
    ``overlap`` / ``bridges`` may be nonzero. Requires overlap/bridges < k
    and comm_size > 2*overlap so ground truth is exactly the communities.

    ``k_per_comm`` optionally sets a *per-community* Harary parameter
    >= k (heterogeneous community strength, like real graphs): community
    i is then exactly ``k_per_comm[i]``-connected, so sweeping the
    enumeration k upward dissolves the weaker communities first — the
    mechanism behind the paper's decreasing Fig. 11 counts.
    """
    if overlap and bridges:
        raise ValueError("choose overlap or bridges, not both")
    if not (0 <= overlap < k and 0 <= bridges < k):
        raise ValueError("separator size must be < k")
    if comm_size <= 2 * overlap:
        raise ValueError("comm_size must exceed 2*overlap")
    if k_per_comm is not None:
        if len(k_per_comm) != n_comms:
            raise ValueError("k_per_comm must have one entry per community")
        if any(kc < k or kc >= comm_size for kc in k_per_comm):
            raise ValueError("k_per_comm entries must satisfy k <= kc < comm_size")
    rng = np.random.default_rng(seed)
    stride = comm_size - overlap
    edges: set[Edge] = set()
    comms: list[set[int]] = []
    for c in range(n_comms):
        base = c * stride
        members = list(range(base, base + comm_size))
        comms.append(set(members))
        # Rotate so overlap vertices play different circulant roles per
        # community (avoids accidental symmetric separators).
        rot = int(rng.integers(0, comm_size))
        rotated = members[rot:] + members[:rot]
        k_c = k if k_per_comm is None else k_per_comm[c]
        for a, b in harary(comm_size, k_c):
            u, v = rotated[a], rotated[b]
            edges.add((min(u, v), max(u, v)))
        for _ in range(extra_chords):
            a, b = rng.choice(comm_size, size=2, replace=False)
            u, v = members[a], members[b]
            edges.add((min(u, v), max(u, v)))
        # Densify only a `dense_frac` share of communities: the dense ones
        # supply strong side-vertices and survive every k; the thin ones
        # keep their exact Harary connectivity and dissolve as k grows.
        if dense_p > 0 and rng.random() < dense_frac:
            for i in range(comm_size):
                for j in range(i + 1, comm_size):
                    if rng.random() < dense_p:
                        u, v = members[i], members[j]
                        edges.add((min(u, v), max(u, v)))
    if bridges:
        for c in range(n_comms - 1):
            left = sorted(comms[c])
            right = sorted(comms[c + 1])
            ls = rng.choice(len(left), size=bridges, replace=False)
            rs = rng.choice(len(right), size=bridges, replace=False)
            for a, b in zip(ls, rs):
                u, v = left[int(a)], right[int(b)]
                edges.add((min(u, v), max(u, v)))
    return PlantedGraph(edges=sorted(edges), communities=comms, k=k)


def chung_lu(
    *,
    n: int,
    target_m: int,
    gamma: float = 2.3,
    seed: int = 0,
    offset: int = 0,
    hub_weight: float = 0.0,
) -> list[Edge]:
    """Power-law background: sample ~target_m edges with endpoint
    probability proportional to w_i = (i+1)^(-1/(gamma-1)); vertex 0 can be
    boosted into a hub via ``hub_weight`` (its weight is multiplied)."""
    rng = np.random.default_rng(seed)
    w = (np.arange(1, n + 1, dtype=np.float64)) ** (-1.0 / (gamma - 1.0))
    if hub_weight > 0:
        w[0] *= hub_weight
    p = w / w.sum()
    # Oversample to compensate for dedup/self-loop losses.
    draws = int(target_m * 1.35) + 16
    a = rng.choice(n, size=draws, p=p)
    b = rng.choice(n, size=draws, p=p)
    lo, hi = np.minimum(a, b), np.maximum(a, b)
    mask = lo != hi
    pairs = np.unique(np.stack([lo[mask], hi[mask]], axis=1), axis=0)
    if len(pairs) > target_m:
        idx = rng.choice(len(pairs), size=target_m, replace=False)
        pairs = pairs[np.sort(idx)]
    return [(int(u) + offset, int(v) + offset) for u, v in pairs]


@dataclass
class AnalogSpec:
    """Recipe for one SNAP-analog dataset (see DESIGN.md substitution 1)."""

    name: str
    n_comms: int
    comm_size: int
    k_min: int  #: weakest community connectivity
    k_max: int  #: strongest community connectivity
    overlap: int
    bridges: int
    extra_chords: int
    dense_p: float
    bg_n: int
    bg_m: int
    gamma: float
    hub_weight: float
    attach_m: int  #: random edges attaching background to communities
    seed: int
    paper_stats: dict[str, float] = field(default_factory=dict)
    dense_frac: float = 0.5  #: share of communities that get dense fill-in


#: Presets tuned so |V|, |E|, density=m/n and max-degree *shape* track the
#: paper's Table 1 at ~1/100 scale (Cit ~1/400). ``paper_stats`` records
#: the original numbers for EXPERIMENTS.md.
SNAP_ANALOGS: dict[str, AnalogSpec] = {
    "stanford": AnalogSpec(
        "stanford", 16, 56, 10, 20, 7, 0, 120, 0.30, 2000, 8500, 2.05, 220.0, 900, 11,
        {"V": 281_903, "E": 2_312_497, "density": 8.20, "max_deg": 38_625},
    ),
    "dblp": AnalogSpec(
        "dblp", 20, 36, 9, 17, 0, 6, 40, 0.80, 2500, 3600, 2.6, 4.0, 500, 12,
        {"V": 317_080, "E": 1_049_866, "density": 3.31, "max_deg": 343},
    ),
    "cnr": AnalogSpec(
        "cnr", 18, 64, 11, 21, 7, 0, 160, 0.45, 2100, 11500, 2.0, 90.0, 1000, 13,
        {"V": 325_557, "E": 3_216_152, "density": 9.88, "max_deg": 18_236},
    ),
    "nd": AnalogSpec(
        "nd", 14, 44, 9, 18, 6, 0, 60, 0.15, 2600, 5200, 2.2, 60.0, 700, 14,
        {"V": 325_729, "E": 1_497_134, "density": 4.60, "max_deg": 10_721},
    ),
    "google": AnalogSpec(
        "google", 24, 48, 9, 19, 7, 0, 90, 0.35, 7000, 16000, 2.35, 18.0, 1600, 15,
        {"V": 875_713, "E": 5_105_039, "density": 5.83, "max_deg": 6_332},
    ),
    "youtube": AnalogSpec(
        "youtube", 10, 40, 9, 17, 0, 5, 50, 0.25, 4200, 7000, 2.1, 120.0, 800, 16,
        {"V": 1_134_890, "E": 2_987_624, "density": 2.63, "max_deg": 28_754},
    ),
    "cit": AnalogSpec(
        "cit", 26, 42, 9, 18, 0, 7, 70, 0.15, 7400, 20000, 2.7, 3.0, 1800, 17,
        {"V": 3_774_768, "E": 16_518_948, "density": 4.38, "max_deg": 793},
    ),
}


def snap_analog(name: str, scale: float = 1.0, seed: int | None = None) -> PlantedGraph:
    """Build the named analog. ``scale`` < 1 shrinks community count and
    background proportionally (used by the Fig. 13 scalability sweep as an
    alternative to sampling). Ground-truth communities are returned but —
    unlike ``planted_kvcc`` — background attachment edges may merge or
    extend them, so they are *approximate* for analogs (not used as test
    oracles; the enumeration itself defines the truth there).
    """
    spec = SNAP_ANALOGS[name]
    seed = spec.seed if seed is None else seed
    rng = np.random.default_rng(seed)
    n_comms = max(2, int(round(spec.n_comms * scale)))
    k_per_comm = [
        int(x) for x in rng.integers(spec.k_min, spec.k_max + 1, n_comms)
    ]
    planted = planted_kvcc(
        n_comms=n_comms,
        comm_size=spec.comm_size,
        k=spec.k_min,
        overlap=spec.overlap,
        bridges=spec.bridges,
        extra_chords=spec.extra_chords,
        dense_p=spec.dense_p,
        dense_frac=spec.dense_frac,
        k_per_comm=k_per_comm,
        seed=seed,
    )
    comm_top = max(max(c) for c in planted.communities) + 1
    bg_n = max(16, int(round(spec.bg_n * scale)))
    bg_m = max(16, int(round(spec.bg_m * scale)))
    bg = chung_lu(
        n=bg_n,
        target_m=bg_m,
        gamma=spec.gamma,
        seed=seed + 1,
        offset=comm_top,
        hub_weight=spec.hub_weight,
    )
    edges = set(planted.edges) | set(bg)
    # Attach background to communities with sparse random edges. Per
    # community we add at most k_min-1 attachments so no community's
    # separator grows to >= its connectivity by accident.
    attach_m = int(round(spec.attach_m * scale))
    per_comm_cap = spec.k_min - 1
    attach_count = {i: 0 for i in range(len(planted.communities))}
    comm_of: dict[int, int] = {}
    for i, c in enumerate(planted.communities):
        for v in c:
            comm_of.setdefault(v, i)
    added = 0
    guard = 0
    while added < attach_m and guard < attach_m * 10:
        guard += 1
        u = int(rng.integers(0, comm_top))
        v = comm_top + int(rng.integers(0, bg_n))
        ci = comm_of.get(u)
        if ci is not None and attach_count[ci] >= per_comm_cap:
            continue
        e = (min(u, v), max(u, v))
        if e in edges:
            continue
        edges.add(e)
        if ci is not None:
            attach_count[ci] += 1
        added += 1
    return PlantedGraph(
        edges=sorted(edges), communities=planted.communities, k=spec.k_min
    )


def stats(edges: list[Edge]) -> dict[str, float]:
    """Table 1 row for an edge list: |V|, |E|, density (=|E|/|V|, the
    paper's convention) and max degree."""
    g = AdjGraph(edges)
    max_deg = max((g.degree(v) for v in g.adj), default=0)
    return {
        "V": g.n,
        "E": g.m,
        "density": round(g.m / g.n, 2) if g.n else 0.0,
        "max_deg": max_deg,
    }
