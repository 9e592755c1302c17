"""Dinic's max-flow — substrate for the flow-based FairDiv baselines.

FairFlow [41] and FairGreedyFlow [7] both reduce fair selection to a
max-flow feasibility problem on a graph with O(mk) nodes and O(mk^2)
edges; the original artifacts used networkx's Ford–Fulkerson, which is
unavailable offline, so we implement Dinic's algorithm (strictly better
asymptotics, same answers). Integer capacities.
"""
from __future__ import annotations

from collections import deque


class Dinic:
    """Max-flow on a directed graph with integer capacities."""

    def __init__(self, n: int):
        self.n = n
        self.to: list[int] = []
        self.cap: list[int] = []
        self.head: list[list[int]] = [[] for _ in range(n)]

    def add_edge(self, u: int, v: int, c: int) -> int:
        """Add edge u->v with capacity c (and residual v->u of 0).
        Returns the edge id of the forward edge."""
        eid = len(self.to)
        self.head[u].append(eid)
        self.to.append(v)
        self.cap.append(c)
        self.head[v].append(eid + 1)
        self.to.append(u)
        self.cap.append(0)
        return eid

    def _bfs(self, s: int, t: int) -> bool:
        self.level = [-1] * self.n
        self.level[s] = 0
        q = deque([s])
        while q:
            u = q.popleft()
            for eid in self.head[u]:
                v = self.to[eid]
                if self.cap[eid] > 0 and self.level[v] < 0:
                    self.level[v] = self.level[u] + 1
                    q.append(v)
        return self.level[t] >= 0

    def _dfs(self, u: int, t: int, f: int) -> int:
        if u == t:
            return f
        while self.it[u] < len(self.head[u]):
            eid = self.head[u][self.it[u]]
            v = self.to[eid]
            if self.cap[eid] > 0 and self.level[v] == self.level[u] + 1:
                d = self._dfs(v, t, min(f, self.cap[eid]))
                if d > 0:
                    self.cap[eid] -= d
                    self.cap[eid ^ 1] += d
                    return d
            self.it[u] += 1
        return 0

    def max_flow(self, s: int, t: int) -> int:
        flow = 0
        while self._bfs(s, t):
            self.it = [0] * self.n
            while True:
                f = self._dfs(s, t, 1 << 60)
                if f == 0:
                    break
                flow += f
        return flow

    def edge_flow(self, eid: int) -> int:
        """Flow pushed through forward edge ``eid`` (its residual cap)."""
        return self.cap[eid ^ 1]
