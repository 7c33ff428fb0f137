"""Dinic max-flow substrate: known graphs + randomized cross-check."""
import numpy as np
import pytest

from repro.flow.dinic import Dinic


def ford_fulkerson(n, edges, s, t):
    """Reference max-flow (BFS augmenting paths on a capacity matrix)."""
    cap = np.zeros((n, n), dtype=np.int64)
    for u, v, c in edges:
        cap[u, v] += c
    flow = 0
    while True:
        parent = [-1] * n
        parent[s] = s
        q = [s]
        while q:
            u = q.pop(0)
            for v in range(n):
                if cap[u, v] > 0 and parent[v] < 0:
                    parent[v] = u
                    q.append(v)
        if parent[t] < 0:
            return flow
        # find bottleneck
        b, v = 1 << 60, t
        while v != s:
            b = min(b, cap[parent[v], v])
            v = parent[v]
        v = t
        while v != s:
            cap[parent[v], v] -= b
            cap[v, parent[v]] += b
            v = parent[v]
        flow += b


def test_single_edge():
    d = Dinic(2)
    d.add_edge(0, 1, 7)
    assert d.max_flow(0, 1) == 7


def test_series_bottleneck():
    d = Dinic(3)
    d.add_edge(0, 1, 10)
    d.add_edge(1, 2, 3)
    assert d.max_flow(0, 2) == 3


def test_parallel_paths():
    d = Dinic(4)
    d.add_edge(0, 1, 2)
    d.add_edge(0, 2, 3)
    d.add_edge(1, 3, 2)
    d.add_edge(2, 3, 3)
    assert d.max_flow(0, 3) == 5


def test_classic_cross_graph():
    # CLRS-style example with a cross edge
    d = Dinic(6)
    for u, v, c in [(0,1,16),(0,2,13),(1,3,12),(2,1,4),(3,2,9),(2,4,14),(4,3,7),(3,5,20),(4,5,4)]:
        d.add_edge(u, v, c)
    assert d.max_flow(0, 5) == 23


def test_disconnected_zero():
    d = Dinic(4)
    d.add_edge(0, 1, 5)
    d.add_edge(2, 3, 5)
    assert d.max_flow(0, 3) == 0


def test_edge_flow_accounting():
    d = Dinic(3)
    e0 = d.add_edge(0, 1, 4)
    d.add_edge(1, 2, 2)
    assert d.max_flow(0, 2) == 2
    assert d.edge_flow(0, e0) == 2


@pytest.mark.parametrize("seed", range(10))
def test_random_graphs_match_reference(seed):
    g = np.random.default_rng(seed)
    n = 8
    edges = []
    for u in range(n):
        for v in range(n):
            if u != v and g.random() < 0.3:
                edges.append((u, v, int(g.integers(1, 10))))
    d = Dinic(n)
    for u, v, c in edges:
        d.add_edge(u, v, c)
    assert d.max_flow(0, n - 1) == ford_fulkerson(n, edges, 0, n - 1)


def test_bipartite_matching_shape():
    # 3 groups x 3 clusters all-to-all with unit caps -> flow 3
    d = Dinic(8)  # s=0, groups 1-3, clusters 4-6, t=7
    for gnode in (1, 2, 3):
        d.add_edge(0, gnode, 1)
        for c in (4, 5, 6):
            d.add_edge(gnode, c, 1)
    for c in (4, 5, 6):
        d.add_edge(c, 7, 1)
    assert d.max_flow(0, 7) == 3
