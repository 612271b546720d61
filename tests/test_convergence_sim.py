"""Op-count convergence simulator tests (§VI-C's 'impact of number of
operators' paragraph)."""
import numpy as np
import pytest

from repro.core.convergence_sim import (
    convergence_epochs,
    sweep_operator_counts,
)


class TestConvergenceEpochs:
    def test_ample_budget_converges(self):
        e = convergence_epochs(np.array([1.0, 5.0]), np.array([0.5, 0.1]), 10.0)
        assert e < 30

    def test_already_stable_zero_epochs(self):
        # Start at the full-local plan with ample budget: stable at once.
        e = convergence_epochs(
            np.array([10.0, 10.0]),
            np.array([0.5, 0.1]),
            1.0,
            start_p=np.ones(2),
        )
        assert e == 0

    def test_tight_budget_converges(self):
        e = convergence_epochs(np.array([3.4, 22.0]), np.array([0.86, 0.02]), 0.3)
        assert 0 < e < 40

    def test_more_ops_not_faster_worstcase(self):
        worst2 = max(
            convergence_epochs(np.array([c1, c2]), np.array([r1, r2]), b)
            for c1 in (1.0, 20.0)
            for c2 in (1.0, 20.0)
            for r1 in (0.1, 0.9)
            for r2 in (0.1, 0.9)
            for b in (0.1, 0.5)
        )
        worst3 = max(
            convergence_epochs(
                np.array([c1, c2, 5.0]), np.array([r1, r2, 0.5]), b
            )
            for c1 in (1.0, 20.0)
            for c2 in (1.0, 20.0)
            for r1 in (0.1, 0.9)
            for r2 in (0.1, 0.9)
            for b in (0.1, 0.5)
        )
        assert worst3 >= worst2


class TestSweep:
    def test_worst_case_grows_with_ops(self):
        """Paper: convergence time grows with operator count, up to ~21
        epochs in the worst case with four operators."""
        res = sweep_operator_counts(
            [2, 3, 4],
            cost_levels=(1.0, 20.0),
            relay_levels=(0.1, 0.9),
            budget_levels=(0.1, 0.5, 0.9),
            max_configs=300,
        )
        worst = {r.n_ops: r.worst_epochs for r in res}
        assert worst[2] <= worst[3] <= worst[4]
        assert worst[4] >= 10  # double-digit worst case, paper: 21
        assert worst[4] <= 40

    def test_mean_below_worst(self):
        res = sweep_operator_counts(
            [2], cost_levels=(1.0, 20.0), relay_levels=(0.5,), budget_levels=(0.3,),
            max_configs=50,
        )
        assert res[0].mean_epochs <= res[0].worst_epochs

    def test_all_configs_converge(self):
        res = sweep_operator_counts(
            [3],
            cost_levels=(1.0, 5.0),
            relay_levels=(0.2, 0.8),
            budget_levels=(0.2, 0.8),
            max_configs=200,
        )
        # max_epochs sentinel (200) would indicate a non-converging config.
        assert res[0].worst_epochs < 100
