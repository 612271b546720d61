"""Epoch simulator sweeps behind the paper's evaluation tables.

Single-source budget sweeps (Fig. 7 / T-7), multi-source scaling over a
shared SP link (Fig. 10 / T-10) and multi-query-per-node aggregation
(Fig. 11 / T-11).  Data-dependent inputs come from Spark-measured
:class:`~repro.cluster.spec.WorkloadSpec`; costs/caps are the
calibrated constants of ``repro.core.costmodel`` (DESIGN.md §6).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import costmodel as cm
from repro.cluster.spec import WorkloadSpec
from repro.strategies.base import Outcome, Strategy
from repro.strategies.jarvis import Jarvis


def budget_sweep(
    spec: WorkloadSpec,
    strategies: list[Strategy],
    budgets: list[float],
    *,
    cap_mbps: float = cm.PER_QUERY_CAP_MBPS,
) -> list[dict]:
    """Throughput per (CPU budget, strategy) on a single data source."""
    rows = []
    for b in budgets:
        for s in strategies:
            out = s.evaluate(spec, b, cap_mbps)
            rows.append(
                {
                    "query": spec.name,
                    "budget_pct": round(b * 100),
                    "strategy": s.name,
                    "throughput_mbps": round(out.throughput_mbps, 2),
                    "traffic_mbps": round(out.traffic_mbps, 2),
                    "compute_core": round(out.compute_core, 3),
                }
            )
    return rows


@dataclass(frozen=True)
class MultiSourceRow:
    strategy: str
    n_sources: int
    per_source_mbps: float
    aggregate_mbps: float
    rho: float
    median_latency_s: float
    max_latency_s: float


def multi_source_sweep(
    spec: WorkloadSpec,
    strategies: list[Strategy],
    n_sources: list[int],
    *,
    budget_core: float,
    agg_link_mbps: float = cm.AGG_LINK_MBPS,
    latency: cm.LatencyModel = cm.DEFAULT_LATENCY,
) -> list[MultiSourceRow]:
    """N identical sources sharing one SP link (Fig. 10).

    Each source's network allowance is the fair share ``link / N``.
    Jarvis' runtime adapts to it (its evaluate sheds input); Best-OP's
    compute-driven plan does not, so its excess queues — ``rho`` above 1
    reports a saturated link and the latency model pins >60 s.
    """
    rows = []
    for s in strategies:
        for n in n_sources:
            cap = agg_link_mbps / n
            out = s.evaluate(spec, budget_core, cap)
            # Offered traffic before network clipping determines rho.
            planned = (
                spec.traffic_mbps(spec.offered_mbps, out.p, bulk_boundary=True)
                if s.name in ("Best-OP", "Filter-Src")
                else out.traffic_mbps
            )
            rho = planned * n / agg_link_mbps
            rows.append(
                MultiSourceRow(
                    strategy=s.name,
                    n_sources=n,
                    per_source_mbps=round(out.throughput_mbps, 2),
                    aggregate_mbps=round(out.throughput_mbps * n, 1),
                    rho=round(rho, 3),
                    median_latency_s=round(latency.median_s(rho), 2),
                    max_latency_s=round(latency.max_s(rho), 2),
                )
            )
    return rows


def max_supported_sources(
    spec: WorkloadSpec,
    strategy: Strategy,
    *,
    budget_core: float,
    agg_link_mbps: float = cm.AGG_LINK_MBPS,
    n_max: int = 400,
    tol: float = 0.99,
) -> int:
    """Largest N at which every source still sustains the offered rate."""
    lo = 0
    for n in range(1, n_max + 1):
        out = strategy.evaluate(spec, budget_core, agg_link_mbps / n)
        if out.throughput_mbps >= tol * spec.offered_mbps:
            lo = n
        else:
            break
    return lo


def multi_query_sweep(
    spec: WorkloadSpec,
    n_queries: list[int],
    *,
    cores: float,
    per_query_budget_core: float,
    cap_mbps: float = cm.PER_QUERY_CAP_MBPS,
    runtime_overhead_core: float = 0.015,
) -> list[dict]:
    """Q query instances with pinned load factors on one node (Fig. 11).

    Each instance is configured (fixed load factors, as in the paper's
    experiment) to use ``per_query_budget_core``; the node's cores are
    shared fairly.  Per-query Jarvis runtime overhead — the paper
    measures "less than 1% of a single core" — is modelled by
    ``runtime_overhead_core``.
    """
    jar = Jarvis()
    solo = jar.evaluate(spec, per_query_budget_core, cap_mbps)
    demand = spec.demand_core(solo.throughput_mbps, solo.p) + runtime_overhead_core
    rows = []
    for q in n_queries:
        share = cores / q
        frac = min(1.0, share / demand) if demand > 0 else 1.0
        per_query = solo.throughput_mbps * frac
        rows.append(
            {
                "query": spec.name,
                "cores": cores,
                "n_queries": q,
                "per_query_mbps": round(per_query, 2),
                "aggregate_mbps": round(per_query * q, 1),
                "saturated": frac < 1.0,
            }
        )
    return rows


def saturation_point(rows: list[dict]) -> int:
    """First Q beyond which aggregate throughput stops increasing (>2%)."""
    best_q = rows[0]["n_queries"]
    best = rows[0]["aggregate_mbps"]
    for r in rows[1:]:
        if r["aggregate_mbps"] > best * 1.02:
            best = r["aggregate_mbps"]
            best_q = r["n_queries"]
    return best_q
