"""Dinic's max-flow algorithm on an adjacency-list residual graph.

FairFlow (Moumoulidou et al., ICDT 2021) solves its fair-assignment step as an
integral max-flow on a small digraph (source -> groups -> elements -> clusters
-> sink). No flow library ships in the container, so this is the substrate.
"""
from __future__ import annotations

from collections import deque


class Dinic:
    """Integer-capacity max flow. Nodes are 0..n-1."""

    def __init__(self, n: int):
        self.n = n
        self.graph: list[list[list[int]]] = [[] for _ in range(n)]  # [to, cap, rev_idx]

    def add_edge(self, u: int, v: int, cap: int) -> int:
        """Add directed edge u->v; returns its index in ``graph[u]``."""
        self.graph[u].append([v, cap, len(self.graph[v])])
        self.graph[v].append([u, 0, len(self.graph[u]) - 1])
        return len(self.graph[u]) - 1

    def _bfs(self, s: int, t: int) -> bool:
        self.level = [-1] * self.n
        self.level[s] = 0
        q = deque([s])
        while q:
            u = q.popleft()
            for v, cap, _ in self.graph[u]:
                if cap > 0 and self.level[v] < 0:
                    self.level[v] = self.level[u] + 1
                    q.append(v)
        return self.level[t] >= 0

    def _dfs(self, u: int, t: int, f: int) -> int:
        if u == t:
            return f
        while self.it[u] < len(self.graph[u]):
            e = self.graph[u][self.it[u]]
            v, cap, rev = e
            if cap > 0 and self.level[v] == self.level[u] + 1:
                d = self._dfs(v, t, min(f, cap))
                if d > 0:
                    e[1] -= d
                    self.graph[v][rev][1] += d
                    return d
            self.it[u] += 1
        return 0

    def max_flow(self, s: int, t: int) -> int:
        flow = 0
        while self._bfs(s, t):
            self.it = [0] * self.n
            while (f := self._dfs(s, t, 1 << 60)) > 0:
                flow += f
        return flow

    def edge_flow(self, u: int, edge_idx: int) -> int:
        """Flow pushed along the ``edge_idx``-th edge out of ``u``."""
        v, _, rev = self.graph[u][edge_idx]
        return self.graph[v][rev][1]
