"""Refinement of a KKT point to a positive-clique solution (Algorithm 4).

Runs on ``G_D+``: while the support's induced subgraph is not a clique,
pick a non-adjacent pair (u, v), merge the mass of the lower-gradient
vertex into the other (which cannot decrease f at a KKT point, per the
proof of Theorem 5), and re-descend to a local KKT point on the shrunken
support. The support strictly shrinks each round, so termination is
guaranteed; the result induces a clique in G_D+, i.e. a positive clique
in G_D.
"""
from __future__ import annotations

from ..graph.local import LocalGraph
from .cd import EPS, local_kkt


def _non_adjacent_pair(g: LocalGraph, S: list):
    for a in range(len(S)):
        ai = g.adj[S[a]]
        for b in range(a + 1, len(S)):
            if S[b] not in ai:
                return S[a], S[b]
    return None


def refine(g_plus: LocalGraph, x: dict, p: dict,
           tol_scale: float = 1e-2) -> None:
    """Refine (x, p) in place to a positive-clique solution on G_D+."""
    while True:
        S = sorted(x.keys())
        pair = _non_adjacent_pair(g_plus, S)
        if pair is None:
            return
        u, v = pair
        # Transfer into the endpoint with the larger gradient so the
        # objective change 2*delta*(p_u - p_v) is non-negative even when
        # the KKT point is only approximate.
        if p.get(u, 0.0) < p.get(v, 0.0):
            u, v = v, u
        delta = x.get(v, 0.0)
        x[u] = x.get(u, 0.0) + delta
        x.pop(v, None)
        for j, w in g_plus.adj[u].items():
            p[j] = p.get(j, 0.0) + delta * w
        for j, w in g_plus.adj[v].items():
            p[j] = p.get(j, 0.0) - delta * w
        S = sorted(x.keys())
        local_kkt(g_plus, x, p, S, tol=tol_scale / max(1, len(S)))
        # Drop numerically-dead mass so the clique test sees the true support.
        for k in [k for k, val in x.items() if val < EPS]:
            x.pop(k, None)
