"""Dinic's maximum-flow algorithm on a static capacitated digraph.

Substrate for the time-expanded reduction (Section 4.2.1): the paper
notes the temporal problem converts to a classic static max-flow
problem; this is the classic solver, built from scratch (no external
graph library is available offline). Works with float capacities and
``math.inf`` (used by holdover edges).
"""
from __future__ import annotations

import math
from collections import deque
from typing import List


class Dinic:
    """Standard Dinic with adjacency lists over an edge array."""

    def __init__(self, n: int):
        self.n = n
        self.graph: List[List[int]] = [[] for _ in range(n)]
        # Flat edge store: to[i], cap[i]; edge i^1 is the reverse edge.
        self.to: List[int] = []
        self.cap: List[float] = []

    def add_edge(self, u: int, v: int, cap: float) -> int:
        """Add a directed edge u->v with capacity ``cap``; returns its id."""
        if cap < 0:
            raise ValueError("negative capacity")
        eid = len(self.to)
        self.to.append(v)
        self.cap.append(cap)
        self.graph[u].append(eid)
        self.to.append(u)
        self.cap.append(0.0)
        self.graph[v].append(eid + 1)
        return eid

    def _bfs(self, s: int, t: int) -> bool:
        self.level = [-1] * self.n
        self.level[s] = 0
        q = deque([s])
        while q:
            u = q.popleft()
            for eid in self.graph[u]:
                v = self.to[eid]
                if self.cap[eid] > 1e-12 and self.level[v] < 0:
                    self.level[v] = self.level[u] + 1
                    q.append(v)
        return self.level[t] >= 0

    def _dfs(self, s: int, t: int) -> float:
        """Find one augmenting path in the level graph (iterative DFS).

        Iterative rather than recursive: time-expanded graphs contain
        holdover chains as long as the interaction count, which would
        blow Python's recursion limit.
        """
        path: List[int] = []  # edge ids along the current path
        u = s
        while True:
            if u == t:
                f = min(self.cap[eid] for eid in path) if path else 0.0
                for eid in path:
                    self.cap[eid] -= f
                    self.cap[eid ^ 1] += f
                return f
            advanced = False
            while self.it[u] < len(self.graph[u]):
                eid = self.graph[u][self.it[u]]
                v = self.to[eid]
                if self.cap[eid] > 1e-12 and self.level[v] == self.level[u] + 1:
                    path.append(eid)
                    u = v
                    advanced = True
                    break
                self.it[u] += 1
            if advanced:
                continue
            # Dead end: retreat (or finish if at the start).
            self.level[u] = -1 if u != s else self.level[u]
            if not path:
                return 0.0
            eid = path.pop()
            u = self.to[eid ^ 1]
            self.it[u] += 1

    def max_flow(self, s: int, t: int) -> float:
        if s == t:
            return 0.0
        flow = 0.0
        while self._bfs(s, t):
            self.it = [0] * self.n
            while True:
                f = self._dfs(s, t)
                if f <= 1e-12:
                    break
                flow += f
        return flow
