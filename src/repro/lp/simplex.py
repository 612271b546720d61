"""Dense two-phase primal simplex solver.

The container has no scipy, and Jarvis' model-based step needs a linear
program solved every Adapt phase (Eq. 3 of the paper).  Problem sizes are
tiny — one variable per query operator (M <= ~6) and at most ``2M + 1``
constraints — so a textbook dense tableau simplex with Bland's
anti-cycling rule is exact, fast, and dependency-free.

Standard form solved here::

    minimize    c @ x
    subject to  A_ub @ x <= b_ub        (optional)
                A_eq @ x == b_eq        (optional)
                x >= 0

Bounds other than ``x >= 0`` must be encoded as rows of ``A_ub`` by the
caller (``repro.lp.plan_lp`` does this for the chain constraint
``e_i <= e_{i-1}``).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

#: Feasibility / optimality tolerance. The plan LPs are well-scaled
#: (coefficients within a few orders of magnitude of 1), so a fixed
#: tolerance is adequate.
_EPS = 1e-9


class LPError(RuntimeError):
    """Raised when the LP is infeasible or unbounded."""


@dataclass(frozen=True)
class LPResult:
    """Solution of a linear program.

    Attributes:
        x: optimal primal solution (original variables only).
        objective: optimal objective value ``c @ x``.
        iterations: total simplex pivots across both phases.
    """

    x: np.ndarray
    objective: float
    iterations: int


def _pivot(T: np.ndarray, basis: np.ndarray, row: int, col: int) -> None:
    """Pivot tableau ``T`` on ``(row, col)`` in place and update the basis."""
    T[row] /= T[row, col]
    for r in range(T.shape[0]):
        if r != row and abs(T[r, col]) > _EPS:
            T[r] -= T[r, col] * T[row]
    basis[row] = col


def _solve_phase(T: np.ndarray, basis: np.ndarray, n_cols: int, max_iter: int) -> int:
    """Run simplex iterations on tableau ``T`` until optimal.

    The last row of ``T`` is the (negated-cost) objective row; the last
    column is the RHS. Bland's rule (smallest eligible index) guarantees
    termination. Returns the number of pivots performed.
    """
    it = 0
    while True:
        obj = T[-1, :n_cols]
        # Entering column: Bland's rule — first column with a positive
        # reduced cost (we maximize the negated objective row).
        col = -1
        for j in range(n_cols):
            if obj[j] > _EPS:
                col = j
                break
        if col < 0:
            return it
        # Leaving row: min ratio test, ties broken by smallest basis index.
        ratios = np.full(T.shape[0] - 1, np.inf)
        for r in range(T.shape[0] - 1):
            if T[r, col] > _EPS:
                ratios[r] = T[r, -1] / T[r, col]
        if not np.isfinite(ratios).any():
            raise LPError("LP is unbounded")
        best = np.min(ratios)
        candidates = [r for r in range(len(ratios)) if ratios[r] <= best + _EPS]
        row = min(candidates, key=lambda r: basis[r])
        _pivot(T, basis, row, col)
        it += 1
        if it > max_iter:
            raise LPError("simplex iteration limit exceeded")


def linprog(
    c: np.ndarray,
    A_ub: np.ndarray | None = None,
    b_ub: np.ndarray | None = None,
    A_eq: np.ndarray | None = None,
    b_eq: np.ndarray | None = None,
) -> LPResult:
    """Solve ``min c@x s.t. A_ub@x <= b_ub, A_eq@x == b_eq, x >= 0``.

    Raises:
        LPError: if the problem is infeasible or unbounded.
    """
    c = np.asarray(c, dtype=float)
    n = c.shape[0]
    rows: list[np.ndarray] = []
    rhs: list[float] = []
    n_slack = 0
    if A_ub is not None:
        A_ub = np.asarray(A_ub, dtype=float).reshape(-1, n)
        b_ub = np.asarray(b_ub, dtype=float).ravel()
        n_slack = A_ub.shape[0]
    n_eq = 0
    if A_eq is not None:
        A_eq = np.asarray(A_eq, dtype=float).reshape(-1, n)
        b_eq = np.asarray(b_eq, dtype=float).ravel()
        n_eq = A_eq.shape[0]

    m = n_slack + n_eq
    if m == 0:
        # No constraints beyond x >= 0: optimum is x = 0 unless some cost
        # coefficient is negative, in which case the LP is unbounded.
        if np.any(c < -_EPS):
            raise LPError("LP is unbounded")
        return LPResult(x=np.zeros(n), objective=0.0, iterations=0)

    # Columns: [x (n)] [slack (n_slack)] [artificial (m)] [rhs].
    n_art = m
    width = n + n_slack + n_art + 1
    T = np.zeros((m + 1, width))
    basis = np.zeros(m, dtype=int)

    r = 0
    if n_slack:
        for i in range(n_slack):
            T[r, :n] = A_ub[i]
            T[r, -1] = b_ub[i]
            T[r, n + i] = 1.0
            r += 1
    if n_eq:
        for i in range(n_eq):
            T[r, :n] = A_eq[i]
            T[r, -1] = b_eq[i]
            r += 1
    # Normalize negative RHS rows so artificials start feasible.
    for i in range(m):
        if T[i, -1] < 0:
            T[i, :] *= -1.0
    for i in range(m):
        T[i, n + n_slack + i] = 1.0
        basis[i] = n + n_slack + i
    # A slack column that survived with +1 coefficient can serve as the
    # initial basic variable directly, making phase 1 trivial for rows
    # that were not sign-flipped; we keep the uniform artificial basis
    # for simplicity — phase 1 removes them quickly at these sizes.

    max_iter = 500 * (width + m)

    # Phase 1: minimize sum of artificials == maximize -(sum of artificials).
    T[-1, :] = 0.0
    for i in range(m):
        T[-1, :] += T[i, :]
    T[-1, n + n_slack : n + n_slack + n_art] = 0.0
    it1 = _solve_phase(T, basis, n + n_slack, max_iter)
    if T[-1, -1] > 1e-7:
        raise LPError("LP is infeasible")
    # Drive any artificial still in the basis out (degenerate rows).
    for i in range(m):
        if basis[i] >= n + n_slack:
            piv = -1
            for j in range(n + n_slack):
                if abs(T[i, j]) > _EPS:
                    piv = j
                    break
            if piv >= 0:
                _pivot(T, basis, i, piv)
            # else: the row is all-zero (redundant constraint) — harmless.

    # Phase 2: maximize -c@x (i.e. minimize c@x) ignoring artificials.
    T[-1, :] = 0.0
    T[-1, :n] = -c
    for i in range(m):
        j = basis[i]
        if j < n + n_slack and abs(T[-1, j]) > _EPS:
            T[-1, :] -= T[-1, j] * T[i, :]
    # Forbid artificials from re-entering by zeroing their columns.
    T[:, n + n_slack : n + n_slack + n_art] = 0.0
    it2 = _solve_phase(T, basis, n + n_slack, max_iter)

    x = np.zeros(n + n_slack)
    for i in range(m):
        if basis[i] < n + n_slack:
            x[basis[i]] = T[i, -1]
    xv = x[:n]
    return LPResult(x=xv, objective=float(c @ xv), iterations=it1 + it2)
