"""Search-reduction strategies (paper §5): strong side-vertices, vertex
deposits, side-groups and group deposits, combined in the SWEEP procedure
(paper Alg. 4).

A "sweep" of vertex v certifies u ≡_k v (source u) without a flow test.
Sweeping is *sound*: it only ever skips tests that would have returned "no
cut", so enabling/disabling sweeps changes counters, never results — a
property the test-suite asserts.

Rule attribution: each swept vertex remembers which rule swept it (``ns1``
= strong side-vertex neighbor, ``ns2`` = vertex deposit >= k, ``gs`` =
group sweep, plus ``tested``/``source`` markers), which is exactly the
bookkeeping behind the paper's Table 2.
"""
from __future__ import annotations

from repro.graph.local import AdjGraph

# Rule tags (Table 2 columns).
NS1 = "ns1"
NS2 = "ns2"
GS = "gs"
TESTED = "tested"
SOURCE = "source"

# Strong side-vertex detection is O(sum d(u)^2); vertices above this degree
# are conservatively treated as non-strong (detection is an optimization —
# missing one only loses pruning, never correctness).
_SSV_DEGREE_CAP = 512


def _pair_k_connected(
    g: AdjGraph, a: int, b: int, k: int, cache: dict[tuple[int, int], bool]
) -> bool:
    """Sufficient check for a ≡_k b: adjacency (Lemma 5) or >= k common
    neighbors (Lemma 13). Cached across callers within one graph."""
    key = (a, b) if a < b else (b, a)
    hit = cache.get(key)
    if hit is not None:
        return hit
    if g.has_edge(a, b):
        res = True
    else:
        na, nb = g.adj[a], g.adj[b]
        if len(na) > len(nb):
            na, nb = nb, na
        common = 0
        res = False
        for x in na:
            if x in nb:
                common += 1
                if common >= k:
                    res = True
                    break
    cache[key] = res
    return res


def is_strong_side_vertex(
    g: AdjGraph,
    u: int,
    k: int,
    cache: dict[tuple[int, int], bool] | None = None,
) -> bool:
    """Theorem 8 check: every pair of u's neighbors is adjacent or shares
    >= k common neighbors."""
    if cache is None:
        cache = {}
    nbrs = sorted(g.adj[u])
    if len(nbrs) > _SSV_DEGREE_CAP:
        return False
    for i, a in enumerate(nbrs):
        for b in nbrs[i + 1 :]:
            if not _pair_k_connected(g, a, b, k, cache):
                return False
    return True


def strong_side_vertices(
    g: AdjGraph, k: int, candidates: set[int] | None = None
) -> set[int]:
    """All strong side-vertices of ``g`` (paper Def. 10).

    ``candidates`` restricts the check to a known superset — the paper's
    Lemma 15 ("not strong in the parent => not strong in the partition")
    lets callers pass the parent's strong side-vertices after a partition
    instead of rechecking every vertex.
    """
    cache: dict[tuple[int, int], bool] = {}
    verts = g.vertices() if candidates is None else sorted(set(candidates) & set(g.adj))
    return {u for u in verts if is_strong_side_vertex(g, u, k, cache)}


def surviving_strong_side_vertices(
    parent_ssv: set[int], child: AdjGraph, cut: set[int], k: int
) -> set[int]:
    """Lemma 15 + 16 incremental maintenance: a parent strong side-vertex
    with no neighbor in the cut stays strong in the partitioned child; one
    that touches the cut must be rechecked; a parent non-strong vertex can
    never become strong."""
    cache: dict[tuple[int, int], bool] = {}
    out: set[int] = set()
    for v in sorted(parent_ssv & set(child.adj)):
        if not (child.adj[v] & cut):
            out.add(v)  # Lemma 16: 2-hop neighborhood untouched
        elif is_strong_side_vertex(child, v, k, cache):
            out.add(v)
    return out


class SweepContext:
    """Mutable sweep state for one GLOBAL-CUT* invocation (paper Alg. 4).

    ``enable_ns`` / ``enable_gs`` gate the neighbor-sweep and group-sweep
    rules, yielding the paper's four variants. Vertex deposits are always
    *maintained* only when neighbor sweep is on (they exist only to fire
    NS rule 2); group deposits only when group sweep is on.
    """

    def __init__(
        self,
        g: AdjGraph,
        k: int,
        ssv: set[int],
        groups: list[set[int]],
        *,
        enable_ns: bool = True,
        enable_gs: bool = True,
    ) -> None:
        self.g = g
        self.k = k
        self.ssv = ssv
        self.enable_ns = enable_ns
        self.enable_gs = enable_gs
        self.groups = groups if enable_gs else []
        self.group_of: dict[int, int] = {}
        for gi, cc in enumerate(self.groups):
            for v in cc:
                self.group_of[v] = gi
        self.pru: dict[int, bool] = {v: False for v in g.adj}
        self.rule: dict[int, str] = {}
        self.deposit: dict[int, int] = {v: 0 for v in g.adj}
        self.g_deposit: list[int] = [0] * len(self.groups)
        self.processed_groups: set[int] = set()

    def same_group(self, a: int, b: int) -> bool:
        """Group sweep rule 3 predicate (phase-2 pair skipping)."""
        ga = self.group_of.get(a)
        return ga is not None and ga == self.group_of.get(b)

    def sweep(self, v0: int, rule0: str) -> None:
        """Paper Alg. 4, iteratively (a worklist replaces recursion so deep
        cascades cannot hit the Python recursion limit)."""
        stack: list[tuple[int, str]] = [(v0, rule0)]
        while stack:
            v, rule = stack.pop()
            if self.pru[v]:
                continue
            self.pru[v] = True
            self.rule[v] = rule
            v_is_ssv = v in self.ssv
            if self.enable_ns:
                for w in sorted(self.g.adj[v]):
                    if self.pru[w]:
                        continue
                    self.deposit[w] += 1
                    if v_is_ssv:
                        stack.append((w, NS1))
                    elif self.deposit[w] >= self.k:
                        stack.append((w, NS2))
            if self.enable_gs:
                gi = self.group_of.get(v)
                if gi is not None and gi not in self.processed_groups:
                    self.g_deposit[gi] += 1
                    if v_is_ssv or self.g_deposit[gi] >= self.k:
                        self.processed_groups.add(gi)
                        for w in sorted(self.groups[gi]):
                            if not self.pru[w]:
                                stack.append((w, GS))
