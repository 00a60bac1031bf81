"""2-Coordinate Descent to a local KKT point (paper Section V-B).

State is kept sparse: ``x`` maps internal vertex index -> simplex value,
``p`` maps index -> (D x)_i for every vertex with a supported neighbor
(the gradient is ``2 p``). Each iteration picks
``i = argmax_{k in S, x_k < 1} p_k`` and ``j = argmin_{k in S, x_k > 0} p_k``,
solves the one-variable quadratic of Eq. 9 analytically, and updates
``x`` and ``p`` incrementally in ``O(|S| + deg(i) + deg(j))``.

Convergence follows the paper's experimental setting:
``max grad - min grad <= 1e-2 / |S|`` (Section VI-A).
"""
from __future__ import annotations

from ..graph.local import LocalGraph

EPS = 1e-12


def apply_delta(g: LocalGraph, x: dict, p: dict, i: int, delta: float) -> None:
    """x_i += delta, maintaining p = D x for all neighbors of i."""
    if delta == 0.0:
        return
    x[i] = x.get(i, 0.0) + delta
    if x[i] < EPS:
        x.pop(i, None)
    for j, w in g.adj[i].items():
        p[j] = p.get(j, 0.0) + delta * w


def objective(x: dict, p: dict) -> float:
    """f(x) = x' D x = sum_u x_u (D x)_u."""
    return sum(v * p.get(u, 0.0) for u, v in x.items())


def init_state(g: LocalGraph, x0: dict) -> tuple[dict, dict]:
    """Build (x, p) from a sparse initial embedding."""
    x: dict = {}
    p: dict = {}
    for u, v in x0.items():
        if v > 0.0:
            apply_delta(g, x, p, u, v)
    return x, p


def solve_pair(g: LocalGraph, x: dict, p: dict, i: int, j: int) -> float:
    """Optimally redistribute mass between x_i and x_j (Eq. 9).

    Returns the signed change applied to x_i (x_j changes by the negative).
    """
    xi = x.get(i, 0.0)
    xj = x.get(j, 0.0)
    c = xi + xj
    d = g.adj[i].get(j, 0.0)
    bi = p.get(i, 0.0) - d * xj
    bj = p.get(j, 0.0) - d * xi

    if d == 0.0:
        if bi > bj:
            new_xi = c
        elif bi < bj:
            new_xi = 0.0
        else:
            return 0.0
    else:
        # g(xi) = -d*xi^2 + B*xi + const with B = d*c + bi - bj.
        b = d * c + bi - bj

        def val(t: float) -> float:
            return -d * t * t + b * t

        cands = [0.0, c]
        r = b / (2.0 * d)
        if 0.0 <= r <= c:
            cands.append(r)
        new_xi = max(cands, key=val)

    delta = new_xi - xi
    if abs(delta) < EPS:
        return 0.0
    apply_delta(g, x, p, i, delta)
    apply_delta(g, x, p, j, -delta)
    return delta


def local_kkt(g: LocalGraph, x: dict, p: dict, S, tol: float | None = None,
              max_iter: int = 200_000) -> int:
    """Drive (x, p) to a local KKT point on vertex set S; returns #iterations.

    Vertices outside S are never touched (their x stays 0), matching
    Eq. 10. ``tol`` defaults to the paper's 1e-2/|S| on the gradient gap.
    """
    S = list(S)
    if len(S) <= 1:
        return 0
    if tol is None:
        tol = 1e-2 / len(S)
    it = 0
    while it < max_iter:
        it += 1
        i_best = None
        i_val = -float("inf")
        j_best = None
        j_val = float("inf")
        for k in S:
            pk = p.get(k, 0.0)
            xk = x.get(k, 0.0)
            if xk < 1.0 and pk > i_val:
                i_val, i_best = pk, k
            if xk > 0.0 and pk < j_val:
                j_val, j_best = pk, k
        if i_best is None or j_best is None:
            break
        # gradient = 2p, so the gap condition is 2*(i_val - j_val) <= tol.
        if 2.0 * (i_val - j_val) <= tol or i_best == j_best:
            break
        if solve_pair(g, x, p, i_best, j_best) == 0.0:
            break  # no improving move despite gap: numerically stalled
    return it
