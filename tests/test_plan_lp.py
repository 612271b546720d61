"""Tests for the Eq. 3 data-level partitioning LP."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.lp.plan_lp import (
    brute_force_plan,
    cumulative_relay,
    e_to_p,
    solve_plan,
)


def test_cumulative_relay():
    R = cumulative_relay(np.array([0.5, 0.2, 1.0]))
    assert R == pytest.approx([1.0, 0.5, 0.1])


def test_e_to_p_simple():
    p = e_to_p(np.array([1.0, 0.5, 0.25]))
    assert p == pytest.approx([1.0, 0.5, 0.5])


def test_e_to_p_zero_upstream():
    p = e_to_p(np.array([0.0, 0.0]))
    assert p == pytest.approx([0.0, 0.0])


def test_unconstrained_budget_runs_everything_locally():
    sol = solve_plan(np.array([0.9, 0.1]), np.array([1.0, 5.0]), budget_per_record=100.0)
    assert sol.e == pytest.approx([1.0, 1.0])
    assert sol.p == pytest.approx([1.0, 1.0])
    assert sol.drained_frac == pytest.approx(0.0)


def test_zero_budget_drains_everything():
    sol = solve_plan(np.array([0.9, 0.1]), np.array([1.0, 5.0]), budget_per_record=0.0)
    assert sol.e == pytest.approx([0.0, 0.0])
    # Everything drains at proxy 1: one record per record.
    assert sol.drained_frac == pytest.approx(1.0)


def test_budget_exactly_first_operator():
    # Budget fits exactly F (cost 1); remaining drains after F.
    r = np.array([0.5, 1.0])
    c = np.array([1.0, 10.0])
    sol = solve_plan(r, c, budget_per_record=1.0)
    # e1=1 costs 1.0, leaving nothing for op2: but op2 processing reduces
    # drains (r2=1 means no reduction) so LP is indifferent about e2 given
    # zero leftover budget; check feasibility + drained value.
    assert sol.compute_per_record <= 1.0 + 1e-9
    # Drained = (1 - e1) + 0.5*(e1 - e2); with e1 = 1, e2 = 0 -> 0.5.
    assert sol.drained_frac == pytest.approx(0.5, abs=1e-6)


def test_prefers_high_reduction_operator():
    """With a tight budget the LP must spend compute where data reduction
    per unit cost is best (the F operator here)."""
    r = np.array([0.1, 1.0])  # op1 filters out 90%, op2 reduces nothing
    c = np.array([1.0, 1.0])
    sol = solve_plan(r, c, budget_per_record=0.5)
    # Optimal is the balanced subset plan e1 = e2 = 0.5/1.1 (drained
    # 0.545), strictly better than spending everything on op1 (0.55).
    assert sol.e == pytest.approx([0.5 / 1.1, 0.5 / 1.1], abs=1e-6)
    assert sol.drained_frac == pytest.approx(1 - 0.5 / 1.1, abs=1e-6)


def test_respects_chain_constraint():
    sol = solve_plan(
        np.array([1.0, 0.0]), np.array([5.0, 0.1]), budget_per_record=1.0
    )
    assert sol.e[1] <= sol.e[0] + 1e-9


def test_s2sprobe_shape():
    """S2SProbe-like instance: W (free), F (cheap, r=0.86), G+R (expensive,
    r~0). At 80% of the budget needed for everything, F runs fully and G+R
    partially — the paper's data-level partitioning example (Fig. 3)."""
    r = np.array([1.0, 0.86, 0.01])
    c = np.array([0.2e-6, 3.4e-6, 22.0e-6])
    full = float(np.sum(cumulative_relay(r) * c))
    sol = solve_plan(r, c, budget_per_record=0.8 * full)
    # The record-minimizing LP picks the balanced subset plan
    # e = (0.8, 0.8, 0.8): drained 0.2, slightly better than running F on
    # everything and G+R on 76% (drained ~0.206).
    assert sol.e == pytest.approx([0.8, 0.8, 0.8], abs=1e-6)
    assert sol.drained_frac == pytest.approx(0.2, abs=1e-6)
    # G+R still processes a large fraction of its input locally.
    assert 0.5 < sol.e[2] < 1.0
    assert sol.drained_frac < 0.86  # better than draining all F output


def test_byte_weights_change_optimum():
    """Byte-weighted objective can prefer draining raw (bulk) records over
    post-filter framed records when the filter barely reduces and drain
    overhead inflates mid-pipeline bytes."""
    r = np.array([0.99, 0.01])
    c = np.array([1.0, 1.0])
    # Proxy 1 drains raw 86B records; proxy 2 records cost 86*1.5 framed.
    wts = np.array([86.0, 86.0 * 1.5])
    rec = solve_plan(r, c, budget_per_record=0.5)
    byt = solve_plan(r, c, budget_per_record=0.5, byte_weights=wts)
    assert byt.drained_frac <= np.sum(
        cumulative_relay(r) * wts * 1.0
    )  # sanity: bounded by drain-all
    # Both must satisfy the budget.
    assert rec.compute_per_record <= 0.5 + 1e-9
    assert byt.compute_per_record <= 0.5 + 1e-9


@pytest.mark.parametrize("budget_frac", [0.0, 0.1, 0.3, 0.5, 0.7, 0.9, 1.0, 1.5])
def test_matches_brute_force_s2s(budget_frac):
    r = np.array([0.86, 0.05])
    c = np.array([3.4, 22.0])
    full = float(np.sum(cumulative_relay(r) * c))
    b = budget_frac * full
    sol = solve_plan(r, c, b)
    _, best = brute_force_plan(r, c, b, grid=25)
    assert sol.drained_frac <= best + 1e-6
    assert sol.compute_per_record <= b + 1e-9


@settings(max_examples=50, deadline=None)
@given(
    m=st.integers(1, 3),
    seed=st.integers(0, 100_000),
    frac=st.floats(0.0, 1.2),
)
def test_matches_brute_force_random(m, seed, frac):
    """LP optimum is never worse than exhaustive monotone grid search."""
    g = np.random.default_rng(seed)
    r = g.uniform(0.0, 1.0, m)
    c = g.uniform(0.1, 10.0, m)
    full = float(np.sum(cumulative_relay(r) * c))
    b = frac * full
    sol = solve_plan(r, c, b)
    _, best = brute_force_plan(r, c, b, grid=10)
    assert sol.drained_frac <= best + 1e-6
    assert sol.compute_per_record <= b + 1e-9
    assert np.all(sol.e >= -1e-9) and np.all(sol.e <= 1 + 1e-9)
    assert np.all(np.diff(sol.e) <= 1e-9)


def test_validation_errors():
    with pytest.raises(ValueError):
        solve_plan(np.array([0.5]), np.array([1.0, 2.0]), 1.0)
    with pytest.raises(ValueError):
        solve_plan(np.array([1.5]), np.array([1.0]), 1.0)
    with pytest.raises(ValueError):
        solve_plan(np.array([0.5]), np.array([-1.0]), 1.0)
    with pytest.raises(ValueError):
        solve_plan(np.array([0.5]), np.array([1.0]), -1.0)


def test_empty_pipeline():
    sol = solve_plan(np.zeros(0), np.zeros(0), 1.0)
    assert sol.e.shape == (0,)
    assert sol.drained_frac == 0.0
