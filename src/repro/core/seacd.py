"""SEACD — Coordinate-Descent Shrink-and-Expansion (paper Algorithm 3).

Shrink: 2-coordinate descent to a local KKT point on the current support
set. Expand: add all vertices whose gradient exceeds ``lambda = 2 f(x)``
and move along the SEA expansion direction. Terminates (a global KKT
point, Theorem 4) when the candidate set Z is empty.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from ..graph.local import LocalGraph
from .cd import init_state, local_kkt, objective
from .expansion import expand, expansion_candidates


@dataclass
class SEAStats:
    shrink_iters: int = 0
    outer_iters: int = 0
    expansion_errors: int = 0  # expansions that decreased f (Section VI-A)


def seacd(g: LocalGraph, start_vertex: int | None = None,
          x0: dict | None = None, tol_scale: float = 1e-2,
          max_outer: int = 500) -> tuple[dict, dict, SEAStats]:
    """Run SEACD on (a positive-part) LocalGraph from a sparse start.

    Returns (x, p, stats). ``start_vertex`` gives the e_u initialization
    of Section V-D; ``x0`` may supply an arbitrary sparse embedding.
    """
    if x0 is None:
        if start_vertex is None:
            raise ValueError("need start_vertex or x0")
        x0 = {start_vertex: 1.0}
    x, p = init_state(g, x0)
    stats = SEAStats()
    stale = 0
    for _ in range(max_outer):
        stats.outer_iters += 1
        S = list(x.keys()) or list(x0.keys())
        tol = tol_scale / max(1, len(S))
        stats.shrink_iters += local_kkt(g, x, p, S, tol=tol)
        f_before = objective(x, p)
        Z = expansion_candidates(g, x, p)
        if not Z:
            break
        expand(g, x, p, Z)
        f_after = objective(x, p)
        if f_after < f_before - 1e-9:
            stats.expansion_errors += 1
        # Stagnation guard: with a finite shrink tolerance, Z can stay
        # marginally non-empty without measurable progress.
        stale = stale + 1 if f_after <= f_before + 1e-12 else 0
        if stale >= 3:
            break
    return x, p, stats
