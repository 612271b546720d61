"""Micro-benchmark: the Eq. 3 LP solve that runs in every Adapt phase.

The paper's point (§III) is that a full optimal partitioning solve is
prohibitively expensive while Jarvis' per-source LP is trivial; this
pins the LP at well under a millisecond — negligible against 1 s epochs.
"""
import numpy as np

from repro.lp.plan_lp import solve_plan


def test_lp_solve_s2s(benchmark):
    r = np.array([1.0, 0.86, 0.02])
    c = np.array([0.2e-6, 3.4e-6, 22.0e-6])
    sol = benchmark(solve_plan, r, c, 15.75e-6)
    assert sol.compute_per_record <= 15.75e-6 + 1e-12


def test_lp_solve_t2t(benchmark):
    r = np.array([1.0, 0.86, 1.0, 1.0, 0.05])
    c = np.array([0.2e-6, 3.4e-6, 39.0e-6, 0.5e-6, 10.7e-6])
    sol = benchmark(solve_plan, r, c, 10.0e-6)
    assert 0 <= sol.drained_frac <= 1


def test_lp_solve_wide_pipeline(benchmark):
    g = np.random.default_rng(0)
    r = g.uniform(0.1, 1.0, 8)
    c = g.uniform(0.5e-6, 30e-6, 8)
    benchmark(solve_plan, r, c, 20e-6)
