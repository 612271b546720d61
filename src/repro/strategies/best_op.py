"""Best-OP: dynamic *operator-level* partitioning (Sonata-style, §VI-A).

A solver picks the longest operator prefix whose full execution fits
the source's compute budget at the offered rate — each operator is
all-or-nothing ("the query planner deploys an operator only if its
available compute resources are sufficient to process ALL of the
operator's ingress data", §I).  The boundary stream relays wholesale.

The plan is compute-driven; when the boundary stream exceeds the
network allowance the excess queues and the delivered throughput
degrades — the behaviour the paper observes in Fig. 10 where Best-OP
becomes network-bottlenecked as sources are added.
"""
from __future__ import annotations

import numpy as np

from repro.cluster.spec import WorkloadSpec
from repro.strategies.base import Outcome, Strategy


class BestOp(Strategy):
    name = "Best-OP"

    def plan(self, spec: WorkloadSpec, budget_core: float) -> np.ndarray:
        """Longest all-or-nothing prefix fitting the budget at offered rate."""
        M = len(spec.cost_us)
        best = np.zeros(M)
        for k in range(1, M + 1):
            p = np.zeros(M)
            p[:k] = 1.0
            if spec.demand_core(spec.offered_mbps, p) <= budget_core + 1e-12:
                best = p
            else:
                break
        return best

    def evaluate(self, spec: WorkloadSpec, budget_core: float, cap_mbps: float) -> Outcome:
        p = self.plan(spec, budget_core)
        traffic = spec.traffic_mbps(spec.offered_mbps, p, bulk_boundary=True)
        frac = min(1.0, cap_mbps / traffic) if traffic > 0 else 1.0
        x = spec.offered_mbps * frac
        return self._outcome(
            spec, x, p, spec.traffic_mbps(x, p, bulk_boundary=True), budget_core
        )
