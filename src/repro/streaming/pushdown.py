"""Data-level partitioning as a Spark Structured Streaming query.

Per the reproduction mapping, the Jarvis dataflow is expressed as a
Structured Streaming query with *partial operators pushed down to the
source side before the shuffle*:

* data sources are partitions of the input stream;
* each control-proxy split and each source-side operator is a narrow
  (pre-shuffle) transformation on the stream;
* the drain paths and the final Group+Reduce are the shuffle — Catalyst
  itself inserts the partial hash-aggregation before the exchange, which
  is exactly the source-side partial aggregate of §IV's data path.

Two entry points:

* :func:`build_partitioned_stream` — the *static-plan* streaming query
  for a fixed load-factor vector (lossless for any ``p``; tested against
  the DuckDB oracle).
* :func:`run_adaptive_stream` — an epoch-driven loop (one micro-batch =
  one epoch, via ``maxFilesPerTrigger=1`` over per-window files) where a
  ``foreachBatch`` hook executes the partitioned plan and lets a live
  :class:`~repro.core.runtime.JarvisRuntime` refine the load factors
  between epochs.
"""
from __future__ import annotations

import os
from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import costmodel as cm
from repro.core.partition_exec import _split_cond, drained_bytes, run_partitioned
from repro.core.pipeline import Pipeline
from repro.core.proxy import EpochObservation, QueryState, classify_query
from repro.core.runtime import JarvisRuntime


def build_partitioned_stream(
    stream_df: DataFrame, pipeline: Pipeline, p: np.ndarray, *, seed: int = 0
) -> DataFrame:
    """Streaming DataFrame computing the partitioned query's final result.

    The source-processed share and every drain path are unioned as
    *records* feeding one terminal groupBy; Spark's partial aggregation
    before the exchange realizes the source-side partial aggregate, so
    the result equals the batch ``run_partitioned`` output for the same
    data (and the unpartitioned query, for any ``p``).
    """
    p = np.asarray(p, dtype=float)
    if p.shape != (pipeline.n_ops,):
        raise ValueError(f"p must have {pipeline.n_ops} entries")
    gr = pipeline.terminal_group_reduce
    if gr is None:
        raise ValueError("streaming pushdown requires a terminal G+R")
    prefix = pipeline.stateless_prefix

    paths: list[DataFrame] = []
    local = stream_df
    for i, op in enumerate(prefix):
        cond = _split_cond(i, float(p[i]), seed)
        drain = local.filter(~cond)
        # The drain path finishes the remaining stateless prefix on the
        # SP replica; in streaming terms it is still narrow work.
        for j in range(i, len(prefix)):
            drain = prefix[j].apply(drain)
        paths.append(drain)
        local = op.apply(local.filter(cond))
    # Terminal proxy: the G+R split. Both shares are G+R *input* records;
    # the exchange's partial aggregation handles the rest.
    paths.append(local)
    from functools import reduce

    union = reduce(DataFrame.unionByName, paths)
    # Single-aggregation form: streaming forbids chained stateful
    # operators; Catalyst's partial aggregation before the exchange is
    # the source-side partial step.
    return gr.direct(union)


@dataclass(frozen=True)
class AdaptiveEpoch:
    """One micro-batch epoch of the adaptive streaming loop."""

    epoch: int
    p: tuple[float, ...]
    state: str
    drained_records: int
    drained_bytes: float
    result_rows: int


class _BatchExecutor:
    """EpochExecutor facade over foreachBatch micro-batches.

    ``run_epoch``-driven executors pull epochs; streaming pushes them.
    This adapter stores the current batch so the runtime's pull sees it.
    """

    def __init__(self, pipeline: Pipeline, budget_core: float) -> None:
        self.pipeline = pipeline
        self.budget_core = budget_core
        self.batch_df: DataFrame | None = None
        self.last_run = None

    def execute(self, p: np.ndarray) -> EpochObservation:
        assert self.batch_df is not None
        run = run_partitioned(self.batch_df, self.pipeline, p)
        self.last_run = run
        forwarded = np.array(run.taken_counts, dtype=float)
        drained = np.array(run.drained_counts, dtype=float)
        demand_s = float(np.sum(forwarded * self.pipeline.cost_us)) * 1e-6
        budget_s = self.budget_core * cm.EPOCH_SECONDS
        scale = 1.0 if demand_s <= budget_s or demand_s == 0 else budget_s / demand_s
        processed = forwarded * scale
        pending = forwarded - processed
        with np.errstate(divide="ignore", invalid="ignore"):
            pending_frac = np.where(forwarded > 0, pending / forwarded, 0.0)
        util = min(1.0, demand_s / budget_s) if budget_s > 0 else 1.0
        return EpochObservation(
            arrived=forwarded + drained,
            forwarded=forwarded,
            processed=processed,
            drained=drained + pending,
            pending_frac=pending_frac,
            idle_frac=np.full(len(p), 1.0 - util),
            compute_used=min(demand_s, budget_s),
            drained_bytes=drained_bytes(run, self.pipeline),
            output_rows=float(run.result.count()),
        )

    def profile(self):
        from repro.core.executor import ProfileEstimates

        assert self.batch_df is not None
        relay = self.pipeline.measure_relay_ratios(self.batch_df)
        est = ProfileEstimates(
            cost_us=self.pipeline.cost_us.copy(),
            relay=relay,
            budget_core=self.budget_core,
        )
        obs = self.execute(np.zeros(self.pipeline.n_ops))
        return est, obs


def write_epoch_files(df: DataFrame, out_dir: str, *, window_s: int = 10) -> int:
    """Materialize a trace as one parquet file-set per window (= epoch)."""
    wcol = F.floor(F.col("ts_s") / window_s).cast("long")
    windows = [r[0] for r in df.select(wcol.alias("w")).distinct().orderBy("w").collect()]
    for w in windows:
        (
            df.filter(wcol == w)
            .coalesce(1)
            .write.mode("overwrite")
            .parquet(os.path.join(out_dir, f"w={w}"))
        )
    return len(windows)


def run_adaptive_stream(
    spark: SparkSession,
    input_dir: str,
    pipeline: Pipeline,
    *,
    budget_core: float,
    checkpoint_dir: str,
    schema=None,
    detect_epochs: int = 1,
    mode: str = "jarvis",
) -> list[AdaptiveEpoch]:
    """Drive the Jarvis runtime from a file-source Structured Stream.

    Each micro-batch (one per-window file, ``maxFilesPerTrigger=1``) is
    an epoch: ``foreachBatch`` executes the current data-level plan,
    feeds the observation to the runtime, and the runtime refines the
    load factors for the next epoch. Returns the per-epoch history.
    """
    if schema is None:
        schema = spark.read.parquet(input_dir).schema
    stream = (
        spark.readStream.schema(schema)
        .option("maxFilesPerTrigger", 1)
        .option("recursiveFileLookup", "true")
        .parquet(input_dir)
    )
    executor = _BatchExecutor(pipeline, budget_core)
    runtime = JarvisRuntime(
        executor, pipeline.n_ops, mode=mode, detect_epochs=detect_epochs
    )
    history: list[AdaptiveEpoch] = []

    def on_batch(batch_df: DataFrame, batch_id: int) -> None:
        if batch_df.isEmpty():
            return
        executor.batch_df = batch_df.cache()
        rep = runtime.run_epoch()
        history.append(
            AdaptiveEpoch(
                epoch=rep.epoch,
                p=tuple(float(v) for v in rep.p),
                state=rep.state.value,
                drained_records=int(np.sum(rep.obs.drained)),
                drained_bytes=float(rep.obs.drained_bytes),
                result_rows=int(rep.obs.output_rows),
            )
        )
        executor.batch_df.unpersist()

    q = (
        stream.writeStream.foreachBatch(on_batch)
        .option("checkpointLocation", checkpoint_dir)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    return history
