"""T-8 (paper Fig. 8): convergence epochs after resource changes.

Runs the real Jarvis runtime (all three §VI-C variants) against the
simulated epoch executor with the paper's scenarios:

* S2SProbe: 10% -> 90% -> 60% CPU;
* T2TProbe: 10% -> 100% CPU, then static table grows 10x;
* LogAnalytics: 5% -> 30% -> 15% CPU (same trend as S2S).

Convergence is the paper's metric: non-stable epochs after the 3-epoch
detection delay; "no-conv" marks runs that never restabilize (LP-only
under biased profiling).
"""
from __future__ import annotations

import numpy as np

from repro.core.costmodel import join_cost_us
from repro.core.executor import SimulatedEpochExecutor
from repro.core.proxy import QueryState
from repro.core.runtime import JarvisRuntime

MODES = ("jarvis", "lp_only", "no_lp")


def _executor(kind: str, budget: float) -> SimulatedEpochExecutor:
    if kind == "s2s":
        return SimulatedEpochExecutor(
            cost_us=np.array([0.2, 3.4, 22.0]),
            relay=np.array([1.0, 0.86, 0.02]),
            stage_bytes=np.array([86.0] * 3),
            budget_core=budget,
            records_per_epoch=38081.0,
            group_reduce_idx=(2,),
        )
    if kind == "t2t":
        return SimulatedEpochExecutor(
            cost_us=np.array([0.2, 3.4, join_cost_us(500), 0.5, 10.7]),
            relay=np.array([1.0, 0.86, 1.0, 1.0, 0.05]),
            stage_bytes=np.array([86.0, 86.0, 86.0, 98.0, 24.0]),
            budget_core=budget,
            records_per_epoch=38081.0,
            group_reduce_idx=(4,),
        )
    if kind == "log":
        return SimulatedEpochExecutor(
            cost_us=np.array([0.1, 1.0, 3.5, 2.1]),
            relay=np.array([1.0, 0.9, 1.0, 0.1]),
            stage_bytes=np.array([128.0, 128.0, 128.0, 40.0]),
            budget_core=budget,
            records_per_epoch=48437.0,
            group_reduce_idx=(3,),
        )
    raise ValueError(kind)


def _measure(rt: JarvisRuntime, max_epochs: int = 40) -> tuple[int | None, bool]:
    reps = rt.run_until_stable(max_epochs)
    nonstable = sum(1 for r in reps if r.state is not QueryState.STABLE)
    converged = reps[-1].state is QueryState.STABLE
    return (max(0, nonstable - rt.detect_epochs) if converged else None, converged)


def run() -> list[dict]:
    rows: list[dict] = []
    scenarios = {
        "s2s": (0.10, [("10%->90% CPU", ("budget", 0.90)), ("90%->60% CPU", ("budget", 0.60))]),
        "t2t": (0.10, [("10%->100% CPU", ("budget", 1.00)), ("table x10", ("table", 5000))]),
        "log": (0.05, [("5%->30% CPU", ("budget", 0.30)), ("30%->15% CPU", ("budget", 0.15))]),
    }
    for kind, (budget0, changes) in scenarios.items():
        for mode in MODES:
            ex = _executor(kind, budget0)
            rt = JarvisRuntime(ex, len(ex.cost_us), mode=mode, relay_hint=ex.relay)
            rt.run_until_stable(80)  # warm-up to the initial stable plan
            for label, (what, value) in changes:
                if what == "budget":
                    ex.budget_core = value
                else:
                    ex.cost_us = ex.cost_us.copy()
                    ex.cost_us[2] = join_cost_us(value)
                epochs, converged = _measure(rt)
                rows.append(
                    {
                        "query": kind,
                        "change": label,
                        "mode": mode,
                        "epochs_after_detect": epochs if converged else "no-conv",
                    }
                )
    return rows
