"""Unit tests for the dense two-phase simplex solver."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.lp.simplex import LPError, linprog


def test_simple_2d_max():
    # min -x - y s.t. x + y <= 1 -> optimum on the facet, objective -1.
    res = linprog(np.array([-1.0, -1.0]), A_ub=[[1.0, 1.0]], b_ub=[1.0])
    assert res.objective == pytest.approx(-1.0)
    assert res.x.sum() == pytest.approx(1.0)


def test_classic_production_problem():
    # max 3x + 5y s.t. x <= 4, 2y <= 12, 3x + 2y <= 18 (Hillier-Lieberman).
    res = linprog(
        np.array([-3.0, -5.0]),
        A_ub=[[1.0, 0.0], [0.0, 2.0], [3.0, 2.0]],
        b_ub=[4.0, 12.0, 18.0],
    )
    assert res.objective == pytest.approx(-36.0)
    assert res.x == pytest.approx([2.0, 6.0])


def test_equality_constraints():
    # min x + 2y s.t. x + y == 1 -> x=1, y=0.
    res = linprog(np.array([1.0, 2.0]), A_eq=[[1.0, 1.0]], b_eq=[1.0])
    assert res.objective == pytest.approx(1.0)
    assert res.x == pytest.approx([1.0, 0.0])


def test_mixed_eq_and_ub():
    # min -y s.t. x + y == 1, y <= 0.25 -> y = 0.25.
    res = linprog(
        np.array([0.0, -1.0]),
        A_ub=[[0.0, 1.0]],
        b_ub=[0.25],
        A_eq=[[1.0, 1.0]],
        b_eq=[1.0],
    )
    assert res.x[1] == pytest.approx(0.25)


def test_infeasible_raises():
    # x >= 0 and x <= -1 is infeasible.
    with pytest.raises(LPError, match="infeasible"):
        linprog(np.array([1.0]), A_ub=[[1.0]], b_ub=[-1.0])


def test_unbounded_raises():
    # min -x with no upper bound.
    with pytest.raises(LPError, match="unbounded"):
        linprog(np.array([-1.0]), A_ub=[[-1.0]], b_ub=[0.0])


def test_no_constraints_zero_optimum():
    res = linprog(np.array([1.0, 0.5]))
    assert res.objective == 0.0


def test_no_constraints_unbounded():
    with pytest.raises(LPError, match="unbounded"):
        linprog(np.array([-1.0, 0.5]))


def test_degenerate_redundant_constraints():
    # Duplicate rows must not break phase 1 artificial removal.
    res = linprog(
        np.array([-1.0]),
        A_ub=[[1.0], [1.0]],
        b_ub=[2.0, 2.0],
        A_eq=[[1.0]],
        b_eq=[2.0],
    )
    assert res.x[0] == pytest.approx(2.0)


def test_negative_rhs_normalization():
    # -x <= -1 means x >= 1; min x -> 1.
    res = linprog(np.array([1.0]), A_ub=[[-1.0]], b_ub=[-1.0])
    assert res.x[0] == pytest.approx(1.0)


@settings(max_examples=60, deadline=None)
@given(
    n=st.integers(2, 4),
    m=st.integers(1, 4),
    seed=st.integers(0, 10_000),
)
def test_random_feasible_lp_beats_grid(n, m, seed):
    """On random LPs with known-feasible interior, the simplex optimum must
    be (a) feasible and (b) no worse than any point of a coarse grid."""
    g = np.random.default_rng(seed)
    A = g.uniform(0.1, 1.0, size=(m, n))
    # Make x = 1 vector feasible with slack.
    b = A @ np.ones(n) * 1.5
    c = g.uniform(-1.0, 1.0, size=n)
    # Add box x_i <= 2 to keep it bounded.
    A_ub = np.vstack([A, np.eye(n)])
    b_ub = np.concatenate([b, np.full(n, 2.0)])
    res = linprog(c, A_ub=A_ub, b_ub=b_ub)
    assert np.all(A_ub @ res.x <= b_ub + 1e-7)
    assert np.all(res.x >= -1e-9)
    # Coarse grid comparison.
    pts = np.linspace(0.0, 2.0, 5)
    grids = np.meshgrid(*([pts] * n))
    X = np.stack([gr.ravel() for gr in grids], axis=1)
    feas = X[np.all(X @ A_ub.T <= b_ub + 1e-12, axis=1)]
    assert res.objective <= float(np.min(feas @ c)) + 1e-7
