"""Unit and property tests for the flow substrate (repro.flow.maxflow)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.flow.maxflow import FlowNetwork


def diamond() -> FlowNetwork:
    """0 -> {1,2} -> 3, all caps 1: max flow 2."""
    net = FlowNetwork(4)
    net.add_edge(0, 1, 1)
    net.add_edge(0, 2, 1)
    net.add_edge(1, 3, 1)
    net.add_edge(2, 3, 1)
    return net


class TestMaxFlow:
    def test_single_edge(self):
        net = FlowNetwork(2)
        net.add_edge(0, 1, 5)
        assert net.max_flow(0, 1, 100) == 5

    def test_no_path(self):
        net = FlowNetwork(3)
        net.add_edge(0, 1, 1)
        assert net.max_flow(0, 2, 10) == 0

    def test_diamond(self):
        assert diamond().max_flow(0, 3, 10) == 2

    def test_limit_early_exit(self):
        assert diamond().max_flow(0, 3, 1) == 1

    def test_limit_zero(self):
        assert diamond().max_flow(0, 3, 0) == 0

    def test_source_is_sink(self):
        assert diamond().max_flow(2, 2, 7) == 7

    def test_bottleneck_chain(self):
        net = FlowNetwork(4)
        net.add_edge(0, 1, 3)
        net.add_edge(1, 2, 1)
        net.add_edge(2, 3, 3)
        assert net.max_flow(0, 3, 10) == 1

    def test_augmenting_path_with_cancellation(self):
        # classic case where a later augmenting path must undo flow
        net = FlowNetwork(4)
        net.add_edge(0, 1, 1)
        net.add_edge(0, 2, 1)
        net.add_edge(1, 2, 1)
        net.add_edge(1, 3, 1)
        net.add_edge(2, 3, 1)
        assert net.max_flow(0, 3, 10) == 2

    def test_reset_restores(self):
        net = diamond()
        assert net.max_flow(0, 3, 10) == 2
        net.reset()
        assert net.max_flow(0, 3, 10) == 2

    def test_reachable_defines_min_cut(self):
        net = diamond()
        net.max_flow(0, 3, 10)
        reach = net.reachable_from(0)
        assert 0 in reach and 3 not in reach

    def test_parallel_arcs(self):
        net = FlowNetwork(2)
        net.add_edge(0, 1, 1)
        net.add_edge(0, 1, 1)
        assert net.max_flow(0, 1, 10) == 2


def _brute_max_flow_unit(n, arcs, s, t):
    """Exponential check: max number of arc-disjoint s-t paths for unit
    capacity arc lists, by simple DFS augmentation on a copy."""
    import copy

    # Ford-Fulkerson with DFS on an independent tiny implementation.
    cap = {}
    adj = {i: set() for i in range(n)}
    for u, v in arcs:
        cap[(u, v)] = cap.get((u, v), 0) + 1
        cap.setdefault((v, u), cap.get((v, u), 0))
        adj[u].add(v)
        adj[v].add(u)
    cap = copy.deepcopy(cap)

    def dfs(u, seen):
        if u == t:
            return True
        seen.add(u)
        for w in sorted(adj[u]):
            if w not in seen and cap[(u, w)] > 0:
                if dfs(w, seen):
                    cap[(u, w)] -= 1
                    cap[(w, u)] += 1
                    return True
        return False

    flow = 0
    while dfs(s, set()):
        flow += 1
    return flow


@settings(max_examples=60, deadline=None)
@given(st.integers(0, 10**9))
def test_max_flow_matches_independent_implementation(seed):
    import random

    rng = random.Random(seed)
    n = rng.randint(3, 7)
    arcs = [
        (u, v)
        for u in range(n)
        for v in range(n)
        if u != v and rng.random() < 0.4
    ]
    net = FlowNetwork(n)
    for u, v in arcs:
        net.add_edge(u, v, 1)
    s, t = 0, n - 1
    expected = _brute_max_flow_unit(n, arcs, s, t)
    assert net.max_flow(s, t, 10**6) == expected


@settings(max_examples=40, deadline=None)
@given(st.integers(0, 10**9))
def test_min_cut_value_equals_flow(seed):
    import random

    rng = random.Random(seed)
    n = rng.randint(3, 7)
    net = FlowNetwork(n)
    arcs = []
    for u in range(n):
        for v in range(n):
            if u != v and rng.random() < 0.45:
                arcs.append((u, v))
                net.add_edge(u, v, 1)
    s, t = 0, n - 1
    flow = net.max_flow(s, t, 10**6)
    reach = net.reachable_from(s)
    if t in reach:
        pytest.fail("sink reachable after max flow")
    crossing = sum(1 for u, v in arcs if u in reach and v not in reach)
    assert crossing == flow
