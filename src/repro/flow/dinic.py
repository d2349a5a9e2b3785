"""Dinic max-flow on integer capacities, with min-cut extraction.

All capacities are Python ints (callers scale exact rationals to a common
denominator first), so min-cut decisions are exact — no floating-point
tolerance anywhere in verification. Both the *minimal* source side
(s-reachable in the residual graph) and the *maximal* source side
(complement of the set that reaches t in the residual graph) can be
extracted; the paper's Theorem 5 needs the maximal one.
"""
from __future__ import annotations

from collections import deque


class Dinic:
    """Max-flow solver. Nodes are 0..n-1; parallel arcs are allowed."""

    def __init__(self, n: int) -> None:
        self.n = n
        # adjacency as arc index lists; arcs stored flat as (to, cap) with
        # the reverse arc at index ^1
        self.to: list[int] = []
        self.cap: list[int] = []
        self.head: list[list[int]] = [[] for _ in range(n)]

    def add_edge(self, u: int, v: int, cap: int, rcap: int = 0) -> None:
        """Directed arc u->v with capacity ``cap`` (and optional reverse cap)."""
        if cap < 0 or rcap < 0:
            raise ValueError("negative capacity")
        self.head[u].append(len(self.to))
        self.to.append(v)
        self.cap.append(cap)
        self.head[v].append(len(self.to))
        self.to.append(u)
        self.cap.append(rcap)

    def _bfs(self, s: int, t: int) -> bool:
        self.level = [-1] * self.n
        self.level[s] = 0
        q = deque([s])
        while q:
            u = q.popleft()
            for a in self.head[u]:
                v = self.to[a]
                if self.cap[a] > 0 and self.level[v] < 0:
                    self.level[v] = self.level[u] + 1
                    q.append(v)
        return self.level[t] >= 0

    def _dfs(self, s: int, t: int) -> int:
        """One blocking-flow phase (iterative DFS with arc pointers)."""
        flow = 0
        it = [0] * self.n
        path: list[int] = []  # arc indices from s to the current node
        u = s
        while True:
            if u == t:
                pushed = min(self.cap[a] for a in path)
                for a in path:
                    self.cap[a] -= pushed
                    self.cap[a ^ 1] += pushed
                flow += pushed
                # retreat to just before the first saturated arc
                for i, a in enumerate(path):
                    if self.cap[a] == 0:
                        del path[i:]
                        break
                u = s if not path else self.to[path[-1]]
                continue
            advanced = False
            while it[u] < len(self.head[u]):
                a = self.head[u][it[u]]
                v = self.to[a]
                if self.cap[a] > 0 and self.level[v] == self.level[u] + 1:
                    path.append(a)
                    u = v
                    advanced = True
                    break
                it[u] += 1
            if advanced:
                continue
            if u == s:
                return flow
            # dead end: remove u from the level graph and retreat; the
            # predecessor's pointer still aims at the arc into u, which the
            # admissibility check now rejects (level[u] == -1) and skips.
            self.level[u] = -1
            path.pop()
            u = s if not path else self.to[path[-1]]

    def max_flow(self, s: int, t: int) -> int:
        total = 0
        while self._bfs(s, t):
            total += self._dfs(s, t)
        return total

    # ------------------------------------------------------------- cut sides
    def min_cut_source_side(self, s: int) -> set[int]:
        """Minimal source side: nodes reachable from s in the residual graph.

        Call after ``max_flow``.
        """
        seen = {s}
        q = deque([s])
        while q:
            u = q.popleft()
            for a in self.head[u]:
                v = self.to[a]
                if self.cap[a] > 0 and v not in seen:
                    seen.add(v)
                    q.append(v)
        return seen

    def max_cut_source_side(self, t: int) -> set[int]:
        """Maximal source side: complement of nodes that reach t residually.

        Call after ``max_flow``.
        """
        reach_t = {t}
        q = deque([t])
        while q:
            v = q.popleft()
            for a in self.head[v]:
                u = self.to[a]
                # u reaches v iff the residual arc u->v (reverse of a) has cap
                if self.cap[a ^ 1] > 0 and u not in reach_t:
                    reach_t.add(u)
                    q.append(u)
        return set(range(self.n)) - reach_t
