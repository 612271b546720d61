"""Epoch executors: how the Jarvis runtime exercises a query for one epoch.

Two implementations of the same interface:

* :class:`SimulatedEpochExecutor` — cost-model execution used by the
  convergence experiments (T-8). It reproduces the paper's key
  profiling pathology: when the compute budget is too small to push a
  full calibration sample through an expensive operator within one
  epoch, the Profile phase returns *biased* estimates (cost
  underestimated, grouping relay ratio overestimated), which is exactly
  why LP-only fails to converge and Jarvis needs fine-tuning epochs.

* :class:`SparkEpochExecutor` — executes real windows of the synthetic
  trace through :func:`repro.core.partition_exec.run_partitioned`;
  drain counts and relay ratios are *measured* from the data, compute
  accounting uses the calibrated per-record model (a shared local JVM
  cannot meter a 1-core budget). Used by integration tests and the
  Structured Streaming demo.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame

from repro.core import costmodel as cm
from repro.core.partition_exec import drained_bytes, run_partitioned
from repro.core.pipeline import Pipeline
from repro.core.proxy import EpochObservation


@dataclass(frozen=True)
class ProfileEstimates:
    """Output of the Profile phase: model inputs for the LP."""

    cost_us: np.ndarray
    relay: np.ndarray
    budget_core: float  # estimated compute budget (fraction of a core)


def flow_counts(n_records: float, p: np.ndarray, relay: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Planned record flow through the proxy chain (no budget limits).

    Returns (arrived, forwarded, drained) per operator for ``n_records``
    injected, load factors ``p`` and relay ratios ``relay``.
    """
    M = len(p)
    arrived = np.zeros(M)
    forwarded = np.zeros(M)
    drained = np.zeros(M)
    cur = float(n_records)
    for i in range(M):
        arrived[i] = cur
        forwarded[i] = cur * p[i]
        drained[i] = cur - forwarded[i]
        cur = forwarded[i] * relay[i]
    return arrived, forwarded, drained


@dataclass
class SimulatedEpochExecutor:
    """Cost-model epoch execution for one data source.

    Attributes:
        cost_us: true per-record operator costs (µs).
        relay: true record relay ratios.
        stage_bytes: wire bytes of a record at each proxy.
        budget_core: compute budget as a fraction of one core (mutable —
            experiments change it to trigger adaptation).
        records_per_epoch: records injected per epoch.
        output_bytes_per_epoch: final aggregate bytes per epoch (adds to
            network, not to drains).
        profile_error_gain: scale of the cost-underestimate when an
            operator cannot be fully profiled in one epoch.
        relay_error_gain: scale of the grouping relay-ratio overestimate
            under truncated profiling samples.
        group_reduce_idx: operator indices whose relay estimate suffers
            the truncated-sample bias (grouping-like operators).
    """

    cost_us: np.ndarray
    relay: np.ndarray
    stage_bytes: np.ndarray
    budget_core: float
    records_per_epoch: float
    output_bytes_per_epoch: float = 0.0
    epoch_s: float = cm.EPOCH_SECONDS
    drain_overhead: float = cm.DRAIN_OVERHEAD
    profile_error_gain: float = 0.5
    relay_error_gain: float = 1.0
    group_reduce_idx: tuple[int, ...] = ()

    def execute(self, p: np.ndarray) -> EpochObservation:
        """Run one epoch under load factors ``p``."""
        p = np.asarray(p, dtype=float)
        arrived, forwarded, drained = flow_counts(
            self.records_per_epoch, p, self.relay
        )
        demand_s = float(np.sum(forwarded * self.cost_us)) * 1e-6
        budget_s = self.budget_core * self.epoch_s
        if demand_s <= budget_s or demand_s == 0.0:
            processed = forwarded.copy()
            scale = 1.0
        else:
            # Budget exhausted: each operator completes a proportional
            # share; the rest is pending and force-drained by the proxy.
            scale = budget_s / demand_s
            processed = forwarded * scale
        pending = forwarded - processed
        with np.errstate(divide="ignore", invalid="ignore"):
            pending_frac = np.where(forwarded > 0, pending / forwarded, 0.0)
        util = min(1.0, demand_s / budget_s) if budget_s > 0 else 1.0
        idle_frac = np.full(len(p), 1.0 - util)
        total_drained = drained + pending
        dbytes = float(
            np.sum(
                total_drained
                * self.stage_bytes
                * np.where(np.arange(len(p)) == 0, 1.0, self.drain_overhead)
            )
        )
        return EpochObservation(
            arrived=arrived,
            forwarded=forwarded,
            processed=processed,
            drained=total_drained,
            pending_frac=pending_frac,
            idle_frac=idle_frac,
            compute_used=min(demand_s, budget_s),
            drained_bytes=dbytes + self.output_bytes_per_epoch,
        )

    def profile(self) -> tuple[ProfileEstimates, EpochObservation]:
        """One Profile epoch: estimate costs, relays and budget.

        The runtime executes "an operator at a time", splitting the
        epoch budget evenly. An operator whose full input sample costs
        more than its share is profiled on a truncated sample:

        * its cost is underestimated by ``profile_error_gain * (1 - f)``
          (fixed per-record overheads amortize worse on small samples,
          and the paper observes exactly this under-estimate driving
          LP-only into congestion);
        * a grouping operator's relay ratio is *overestimated* by
          ``relay_error_gain * (1 - f)`` of its headroom (group count /
          record count rises on truncated samples).

        Profiling consumes the epoch: the query drains everything, so
        this counts as a non-stable epoch in convergence accounting.
        """
        M = len(self.cost_us)
        # Input seen by each operator if everything were forwarded.
        full_arrived, _, _ = flow_counts(
            self.records_per_epoch, np.ones(M), self.relay
        )
        share_s = self.budget_core * self.epoch_s / max(M, 1)
        needed_s = full_arrived * self.cost_us * 1e-6
        with np.errstate(divide="ignore", invalid="ignore"):
            frac = np.where(needed_s > 0, np.minimum(1.0, share_s / needed_s), 1.0)
        cost_hat = self.cost_us * (1.0 - self.profile_error_gain * (1.0 - frac))
        relay_hat = self.relay.copy()
        for i in self.group_reduce_idx:
            headroom = 1.0 - self.relay[i]
            relay_hat[i] = self.relay[i] + self.relay_error_gain * (1.0 - frac[i]) * headroom
        est = ProfileEstimates(
            cost_us=cost_hat, relay=relay_hat, budget_core=self.budget_core
        )
        obs = self.execute(np.zeros(M))  # profiling epoch drains the stream
        return est, obs


@dataclass
class SparkEpochExecutor:
    """Epoch execution over real data via ``run_partitioned``.

    Each epoch draws the next window (``window_id`` round-robin) from a
    pre-generated trace and executes it under the current load factors.
    Relay ratios and drain counts are measured from the data; compute
    accounting uses the calibrated per-record cost model and the
    configured budget.
    """

    df: DataFrame
    pipeline: Pipeline
    budget_core: float
    epoch_s: float = cm.EPOCH_SECONDS
    drain_overhead: float = cm.DRAIN_OVERHEAD
    seed: int = 0
    _windows: list[int] = field(default_factory=list)
    _epoch_no: int = 0

    def __post_init__(self) -> None:
        from pyspark.sql import functions as F

        wcol = F.floor(F.col("ts_s") / 10).cast("long")
        self.df = self.df.withColumn("__w", wcol).cache()
        self._windows = [
            r["__w"] for r in self.df.select("__w").distinct().orderBy("__w").collect()
        ]

    def _next_window(self) -> DataFrame:
        w = self._windows[self._epoch_no % len(self._windows)]
        self._epoch_no += 1
        return self.df.filter(f"__w = {w}").drop("__w")

    def execute(self, p: np.ndarray) -> EpochObservation:
        p = np.asarray(p, dtype=float)
        win = self._next_window()
        run = run_partitioned(win, self.pipeline, p, seed=self.seed + self._epoch_no)
        forwarded = np.array(run.taken_counts, dtype=float)
        drained = np.array(run.drained_counts, dtype=float)
        arrived = forwarded + drained
        demand_s = float(np.sum(forwarded * self.pipeline.cost_us)) * 1e-6
        budget_s = self.budget_core * self.epoch_s
        if demand_s <= budget_s or demand_s == 0:
            processed = forwarded.copy()
        else:
            processed = forwarded * (budget_s / demand_s)
        pending = forwarded - processed
        with np.errstate(divide="ignore", invalid="ignore"):
            pending_frac = np.where(forwarded > 0, pending / forwarded, 0.0)
        util = min(1.0, demand_s / budget_s) if budget_s > 0 else 1.0
        return EpochObservation(
            arrived=arrived,
            forwarded=forwarded,
            processed=processed,
            drained=drained + pending,
            pending_frac=pending_frac,
            idle_frac=np.full(len(p), 1.0 - util),
            compute_used=min(demand_s, budget_s),
            drained_bytes=drained_bytes(
                run, self.pipeline, drain_overhead=self.drain_overhead
            ),
            output_rows=float(run.result.count()),
        )

    def profile(self) -> tuple[ProfileEstimates, EpochObservation]:
        """Measure relay ratios from a real window (possibly truncated).

        The calibration sample for each operator is capped at what the
        budget share can process in one epoch — so an expensive G+R
        measured on a truncated sample genuinely reports a higher
        group-per-record ratio, the bias the paper describes.
        """
        win = self._next_window().cache()
        M = self.pipeline.n_ops
        share_s = self.budget_core * self.epoch_s / M
        cur = win
        relays: list[float] = []
        n_in = cur.count()
        for i, op in enumerate(self.pipeline.stateless_prefix):
            afford = int(share_s / (self.pipeline.cost_us[i] * 1e-6)) if self.pipeline.cost_us[i] > 0 else n_in
            sample = cur.limit(min(n_in, max(afford, 1)))
            n_s = sample.count()
            out = op.apply(sample)
            n_o = out.count()
            relays.append(min(1.0, n_o / n_s) if n_s else 1.0)
            cur = op.apply(cur)
            n_in = cur.count()
        gr = self.pipeline.terminal_group_reduce
        if gr is not None:
            i = M - 1
            afford = int(share_s / (self.pipeline.cost_us[i] * 1e-6)) if self.pipeline.cost_us[i] > 0 else n_in
            sample = cur.limit(min(n_in, max(afford, 1)))
            n_s = sample.count()
            n_o = gr.apply(sample).count()
            relays.append(min(1.0, n_o / n_s) if n_s else 1.0)
        win.unpersist()
        est = ProfileEstimates(
            cost_us=self.pipeline.cost_us.copy(),
            relay=np.array(relays),
            budget_core=self.budget_core,
        )
        obs = self.execute(np.zeros(M))
        return est, obs
