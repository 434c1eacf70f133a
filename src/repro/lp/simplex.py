"""Dense primal simplex solver — offline substitute for lpsolve.

The paper solves max-flow LPs with the lpsolve library; that (and any
other LP package) is unavailable here, so this module implements the
solver from scratch. Scope is exactly what `repro.lp.model` produces:

    maximize    c @ x
    subject to  A @ x <= b,   x >= 0,   with b >= 0

``b >= 0`` means the all-slack basis is feasible, so a single-phase
tableau simplex suffices (no two-phase / big-M machinery). Pivoting is
Dantzig's rule for speed with a Bland's-rule fallback for anti-cycling
once degenerate stalling is detected, which guarantees termination.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

_TOL = 1e-9


class SimplexError(RuntimeError):
    """Raised on malformed input or a non-terminating solve."""


@dataclass
class LPResult:
    value: float
    x: np.ndarray
    iterations: int


def solve_lp_maximize(
    c: np.ndarray,
    A: np.ndarray,
    b: np.ndarray,
    *,
    max_iter: int | None = None,
) -> LPResult:
    """Solve ``max c@x s.t. A@x <= b, x >= 0`` (requires ``b >= 0``).

    Returns the optimal value and one optimal vertex solution. Raises
    :class:`SimplexError` if the LP is unbounded (cannot happen for the
    flow LPs, whose variables are box-bounded) or the input is invalid.
    """
    c = np.asarray(c, dtype=np.float64)
    A = np.asarray(A, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    if A.ndim != 2:
        raise SimplexError("A must be 2-D")
    m, n = A.shape
    if c.shape != (n,) or b.shape != (m,):
        raise SimplexError("shape mismatch between c, A, b")
    if np.any(b < -_TOL):
        raise SimplexError("b must be non-negative (all-slack basis infeasible)")
    b = np.maximum(b, 0.0)

    if n == 0 or m == 0:
        # No variables or no constraints binding them: with x >= 0 the
        # optimum is 0 unless some c_j > 0 with no constraint (unbounded).
        if m == 0 and np.any(c > _TOL):
            raise SimplexError("unbounded LP")
        return LPResult(0.0, np.zeros(n), 0)

    # Tableau: m rows of [A | I | b] and an objective row [-c | 0 | 0].
    T = np.zeros((m + 1, n + m + 1), dtype=np.float64)
    T[:m, :n] = A
    T[:m, n : n + m] = np.eye(m)
    T[:m, -1] = b
    T[m, :n] = -c
    basis = list(range(n, n + m))

    if max_iter is None:
        max_iter = 200 * (m + n) + 2000
    bland = False
    stall = 0
    last_obj = 0.0
    for it in range(max_iter):
        obj_row = T[m, :-1]
        if bland:
            elig = np.nonzero(obj_row < -_TOL)[0]
            if elig.size == 0:
                return _finish(T, basis, n, m, it)
            j = int(elig[0])
        else:
            j = int(np.argmin(obj_row))
            if obj_row[j] >= -_TOL:
                return _finish(T, basis, n, m, it)
        col = T[:m, j]
        pos = col > _TOL
        if not np.any(pos):
            raise SimplexError("unbounded LP")
        ratios = np.full(m, np.inf)
        ratios[pos] = T[:m, -1][pos] / col[pos]
        r = int(np.argmin(ratios))  # ties -> lowest row index (Bland-safe)
        # Pivot on (r, j).
        T[r, :] /= T[r, j]
        piv = T[r, :]
        factors = T[:, j].copy()
        factors[r] = 0.0
        T -= np.outer(factors, piv)
        T[:, j] = 0.0
        T[r, j] = 1.0
        basis[r] = j
        # Degeneracy watch: if the objective stops improving, switch to
        # Bland's rule (terminates by theory).
        obj = T[m, -1]
        if obj <= last_obj + _TOL:
            stall += 1
            if stall > m + n:
                bland = True
        else:
            stall = 0
        last_obj = max(last_obj, obj)
    raise SimplexError(f"simplex did not terminate in {max_iter} iterations")


def _finish(T: np.ndarray, basis: list, n: int, m: int, it: int) -> LPResult:
    x = np.zeros(n)
    for r, j in enumerate(basis):
        if j < n:
            x[j] = T[r, -1]
    return LPResult(float(T[m, -1]), x, it)
