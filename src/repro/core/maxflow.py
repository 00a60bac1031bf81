"""Goldberg's exact maximum-density subgraph via max-flow [12].

Used as a *test oracle* for greedy quality on graphs with non-negative
weights (the setting where Goldberg's reduction is valid). Density here
is Goldberg's ``sum of edge weights / |S|`` (single-counted); callers
convert to the paper's double-counted rho by multiplying by 2.

Construction for a guess ``gss``: source->v with capacity d_v (weighted
degree), v<->u with capacity w_uv, v->sink with capacity 2*gss. A min cut
strictly below 2*W_total certifies a subgraph with density > gss; binary
search over gss converges to the optimum (for rational weights, ~60 float
iterations give far more than enough precision for tests).
"""
from __future__ import annotations

from collections import deque

from ..graph.local import LocalGraph


class _Dinic:
    def __init__(self, n: int):
        self.n = n
        self.g: list = [[] for _ in range(n)]

    def add(self, u: int, v: int, cap: float, cap_rev: float = 0.0):
        self.g[u].append([v, cap, len(self.g[v])])
        self.g[v].append([u, cap_rev, len(self.g[u]) - 1])

    def _bfs(self, s: int, t: int) -> bool:
        self.level = [-1] * self.n
        self.level[s] = 0
        q = deque([s])
        while q:
            u = q.popleft()
            for e in self.g[u]:
                if e[1] > 1e-12 and self.level[e[0]] < 0:
                    self.level[e[0]] = self.level[u] + 1
                    q.append(e[0])
        return self.level[t] >= 0

    def _dfs(self, u: int, t: int, f: float) -> float:
        if u == t:
            return f
        while self.it[u] < len(self.g[u]):
            e = self.g[u][self.it[u]]
            v = e[0]
            if e[1] > 1e-12 and self.level[v] == self.level[u] + 1:
                d = self._dfs(v, t, min(f, e[1]))
                if d > 1e-12:
                    e[1] -= d
                    self.g[v][e[2]][1] += d
                    return d
            self.it[u] += 1
        return 0.0

    def max_flow(self, s: int, t: int) -> float:
        flow = 0.0
        while self._bfs(s, t):
            self.it = [0] * self.n
            while True:
                f = self._dfs(s, t, float("inf"))
                if f <= 1e-12:
                    break
                flow += f
        return flow

    def min_cut_side(self, s: int) -> set:
        """Vertices reachable from s in the residual graph (after max_flow)."""
        seen = {s}
        q = deque([s])
        while q:
            u = q.popleft()
            for e in self.g[u]:
                if e[1] > 1e-12 and e[0] not in seen:
                    seen.add(e[0])
                    q.append(e[0])
        return seen


def exact_densest(g: LocalGraph, iters: int = 60) -> tuple[list, float]:
    """Exact max of (edge-weight sum)/|S| on a non-negative-weight graph.

    Returns (S, density_single_counted). Empty graph -> ([], 0).
    """
    verts = [v for v in range(g.n) if g.adj[v]]
    if not verts:
        return ([0] if g.n else []), 0.0
    idx = {v: k for k, v in enumerate(verts)}
    n = len(verts)
    deg = {v: sum(g.adj[v].values()) for v in verts}
    w_total = sum(deg.values()) / 2.0
    lo, hi = 0.0, max(deg.values())
    best: list = [verts[0]]
    for _ in range(iters):
        gss = (lo + hi) / 2.0
        net = _Dinic(n + 2)
        s, t = n, n + 1
        for v in verts:
            net.add(s, idx[v], deg[v])
            net.add(idx[v], t, 2.0 * gss)
            for u, w in g.adj[v].items():
                if u > v and u in idx:
                    net.add(idx[v], idx[u], w, w)
        flow = net.max_flow(s, t)
        if flow < 2.0 * w_total - 1e-9:
            side = net.min_cut_side(s)
            cand = [v for v in verts if idx[v] in side]
            if cand:
                best = cand
            lo = gss
        else:
            hi = gss
    dens = g.subgraph_weight(best) / len(best)
    return sorted(best), dens
