"""Unit tests for StepWise-Adapt: priorities, LP init, fine-tuner."""
import numpy as np
import pytest

from repro.core.executor import ProfileEstimates
from repro.core.proxy import QueryState
from repro.core.stepwise import FineTuner, ffd_priority_order, lp_initial_plan


class TestPriorities:
    def test_lower_relay_higher_priority(self):
        order = ffd_priority_order(np.array([1.0, 0.86, 0.02]))
        assert list(order) == [2, 1, 0]

    def test_ties_break_downstream_first(self):
        order = ffd_priority_order(np.array([0.5, 0.5, 1.0]))
        assert list(order) == [1, 0, 2]

    def test_single_op(self):
        assert list(ffd_priority_order(np.array([0.3]))) == [0]


class TestLPInit:
    def test_ample_budget_all_ones(self):
        est = ProfileEstimates(
            cost_us=np.array([1.0, 5.0]), relay=np.array([0.5, 0.1]), budget_core=1.0
        )
        p = lp_initial_plan(est, records_per_epoch=1000.0)
        assert p == pytest.approx([1.0, 1.0])

    def test_zero_budget_all_zero_flow(self):
        est = ProfileEstimates(
            cost_us=np.array([1.0, 5.0]), relay=np.array([0.5, 0.1]), budget_core=0.0
        )
        p = lp_initial_plan(est, records_per_epoch=1000.0)
        # e = 0 everywhere; recovered p starts at 0 upstream.
        assert p[0] == pytest.approx(0.0)

    def test_no_records_defaults_to_ones(self):
        est = ProfileEstimates(
            cost_us=np.array([1.0]), relay=np.array([0.5]), budget_core=0.5
        )
        assert lp_initial_plan(est, records_per_epoch=0.0) == pytest.approx([1.0])

    def test_kappa_scales_costs(self):
        est = ProfileEstimates(
            cost_us=np.array([10.0]), relay=np.array([0.0]), budget_core=0.5
        )
        # budget/rec = 0.5s/1e5 = 5µs; cost 10µs -> e = 0.5.
        p1 = lp_initial_plan(est, records_per_epoch=1e5)
        p2 = lp_initial_plan(est, records_per_epoch=1e5, kappa=2.0)
        assert p1[0] == pytest.approx(0.5)
        assert p2[0] == pytest.approx(0.25)


def tuner(relay=(1.0, 0.86, 0.02), **kw):
    return FineTuner(relay=np.array(relay), **kw)


class TestFineTuner:
    def test_stable_returns_none(self):
        t = tuner()
        assert t.next_p(np.array([0.5, 1.0, 1.0]), QueryState.STABLE) is None

    def test_idle_raises_highest_priority_first(self):
        # G+R (idx 2, lowest relay) has p < 1: it must be raised first.
        t = tuner()
        p = t.next_p(np.array([1.0, 1.0, 0.5]), QueryState.IDLE)
        assert p is not None
        assert p[2] > 0.5
        assert p[0] == 1.0 and p[1] == 1.0

    def test_idle_skips_saturated_ops(self):
        # G+R and F already at 1: only W can be raised.
        t = tuner()
        p = t.next_p(np.array([0.5, 1.0, 1.0]), QueryState.IDLE)
        assert p is not None
        assert p[0] > 0.5

    def test_congested_lowers_lowest_priority_first(self):
        # W (relay 1.0) is lowest priority: lowered first.
        t = tuner()
        p = t.next_p(np.array([1.0, 1.0, 1.0]), QueryState.CONGESTED)
        assert p is not None
        assert p[0] < 1.0
        assert p[1] == 1.0 and p[2] == 1.0

    def test_congested_skips_zero_ops(self):
        t = tuner()
        p = t.next_p(np.array([0.0, 1.0, 1.0]), QueryState.CONGESTED)
        assert p is not None
        assert p[0] == 0.0
        assert p[1] < 1.0  # next lowest priority (F)

    def test_all_zero_congested_no_moves(self):
        t = tuner()
        assert t.next_p(np.zeros(3), QueryState.CONGESTED) is None

    def test_all_one_idle_no_moves(self):
        t = tuner()
        assert t.next_p(np.ones(3), QueryState.IDLE) is None

    def test_binary_search_narrows(self):
        """Alternating congested/idle feedback must narrow the interval
        monotonically and terminate on the 1/grid lattice."""
        t = tuner(grid=16)
        p = np.array([1.0, 1.0, 1.0])
        states = [QueryState.CONGESTED, QueryState.CONGESTED, QueryState.IDLE,
                  QueryState.CONGESTED, QueryState.IDLE, QueryState.IDLE,
                  QueryState.CONGESTED]
        probes = []
        for s in states:
            nxt = t.next_p(p, s)
            if nxt is None:
                break
            probes.append(nxt[0] if nxt[0] != p[0] else nxt[1])
            p = nxt
        # All probes on the lattice.
        for v in probes:
            assert abs(v * 16 - round(v * 16)) < 1e-9

    def test_probes_on_grid(self):
        t = tuner(grid=8)
        p = t.next_p(np.array([1.0, 1.0, 0.3]), QueryState.IDLE)
        assert abs(p[2] * 8 - round(p[2] * 8)) < 1e-9

    def test_model_predicted_first_probe(self):
        """With profile estimates, the first probe lands at the predicted
        stable point, not the midpoint."""
        est = ProfileEstimates(
            cost_us=np.array([1.0, 1.0, 20.0]),
            relay=np.array([1.0, 0.86, 0.02]),
            budget_core=0.5,
        )
        t = tuner(model=est, records_per_epoch=38081.0)
        p = t.next_p(np.ones(3), QueryState.CONGESTED)
        # Demand at p=1: (1 + 1 + 0.86*20)*38081µs = 0.73 core-s; solving
        # for W's factor that hits 0.97*0.5 budget: ~0.66 (snapped).
        assert p is not None
        assert 0.5 < p[0] < 0.8

    def test_kappa_update(self):
        est = ProfileEstimates(
            cost_us=np.array([10.0]), relay=np.array([0.0]), budget_core=0.5
        )
        t = tuner(relay=(0.0,), model=est, records_per_epoch=1e5)
        # Estimated demand at p=1: 1e5*10µs = 1.0 core-s; observed usage
        # 0.5 with 50% pending -> actual demand 1.0 -> kappa stays ~1.
        t.update_kappa(np.array([1.0]), compute_used=0.5, pending_frac=0.5)
        assert t.kappa == pytest.approx(1.0, rel=0.05)
        # Observed demand twice the estimate -> kappa doubles.
        t.update_kappa(np.array([1.0]), compute_used=0.5, pending_frac=0.75)
        assert t.kappa == pytest.approx(2.0, rel=0.05)

    def test_direction_change_clears_exhaustion(self):
        t = tuner()
        p = np.ones(3)
        # Exhaust the lowering path down to all-zero.
        while True:
            nxt = t.next_p(p, QueryState.CONGESTED)
            if nxt is None:
                break
            p = nxt
        # Now idle: raising must become possible again.
        nxt = t.next_p(p, QueryState.IDLE)
        assert nxt is not None
