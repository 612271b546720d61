"""Lossless data-level partitioned query execution on Spark.

This is the reproduction's core: the control-proxy data path.  Given a
window of records tagged by ``source_id`` and a load-factor vector
``p`` (one entry per operator), each proxy forwards a deterministic
``p_i`` fraction of its operator's input to the *local* (source-side)
operator and **drains** the rest to the stream processor, where a
replicated copy of the remaining pipeline finishes the work.  Partial
aggregates from both sides merge into the final result.

Mapping to Spark (per the reproduction hint): data sources are stream
partitions; source-side operators are narrow, pre-shuffle
transformations; the drain paths and the final merge are the shuffle.
For *any* ``p`` the merged output equals the unpartitioned query — the
oracle tests pin this invariant.

Record splitting hashes ``record_id`` with the proxy index and a seed
(``xxhash64``), so runs are deterministic and the per-stage splits are
mutually independent.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import reduce

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.operators import RECORD_ID
from repro.core.pipeline import Pipeline

#: Hash-bucket resolution for load-factor splits (1e6 buckets ≈ 1e-6 p
#: granularity, far finer than the runtime's 1/16 grid).
_BUCKETS = 1_000_000


@dataclass(frozen=True)
class PartitionedRun:
    """Outcome of one partitioned window execution.

    Attributes:
        result: final merged query output (equals the unpartitioned run).
        taken_counts: records processed locally per operator.
        drained_counts: records drained at each proxy (index = operator).
        source_partial_rows: partial-aggregate rows shipped by the source
            (0 when the pipeline has no terminal G+R or ``p_M`` = 0).
        sp_input_counts: records entering each SP-side replicated operator.
    """

    result: DataFrame
    taken_counts: tuple[int, ...]
    drained_counts: tuple[int, ...]
    source_partial_rows: int
    sp_input_counts: tuple[int, ...]


def _split_cond(stage: int, p: float, seed: int):
    """Deterministic Bernoulli(p) split on ``record_id`` for one proxy."""
    h = F.xxhash64(F.col(RECORD_ID), F.lit(stage), F.lit(seed))
    return F.pmod(h, F.lit(_BUCKETS)) < F.lit(int(round(p * _BUCKETS)))


def run_partitioned(
    df: DataFrame,
    pipeline: Pipeline,
    p: np.ndarray | list[float],
    *,
    seed: int = 0,
    collect_metrics: bool = True,
) -> PartitionedRun:
    """Execute ``pipeline`` on ``df`` under load-factor vector ``p``.

    Args:
        df: one window (or epoch) of input records; must carry
            ``record_id``.
        pipeline: validated operator chain.
        p: load factor per operator, each in [0, 1]. ``p=1`` everywhere
            is All-Src; ``p=0`` everywhere is All-SP.
        seed: split seed — different seeds re-randomize proxy splits.
        collect_metrics: when False, skip the ``count()`` actions and
            return -1 counts (cheaper for benchmarks that only need the
            result or a single aggregate action).

    Returns:
        PartitionedRun with the merged result and drain accounting.
    """
    p = np.asarray(p, dtype=float)
    if p.shape != (pipeline.n_ops,):
        raise ValueError(
            f"p has shape {p.shape}, expected ({pipeline.n_ops},) for "
            f"pipeline {pipeline.name}"
        )
    if np.any(p < 0) or np.any(p > 1):
        raise ValueError("load factors must lie in [0, 1]")
    if RECORD_ID not in df.columns:
        raise ValueError(f"input must carry a '{RECORD_ID}' column")

    prefix = pipeline.stateless_prefix
    gr = pipeline.terminal_group_reduce

    # --- source side: split at every proxy, process the taken share ---------
    drains: list[tuple[int, DataFrame]] = []  # (stage idx, records to finish)
    local = df
    for i, op in enumerate(prefix):
        cond = _split_cond(i, float(p[i]), seed)
        drains.append((i, local.filter(~cond)))
        local = op.apply(local.filter(cond))

    source_partial: DataFrame | None = None
    if gr is not None:
        i = pipeline.n_ops - 1
        cond = _split_cond(i, float(p[i]), seed)
        drains.append((i, local.filter(~cond)))
        source_partial = gr.partial(local.filter(cond))
        local = None  # terminal: nothing flows past G+R on the source

    # --- stream processor side: finish each drained stream -------------------
    # A drain at stage i replays operators i..end on the SP replica. All
    # drain paths that reach the terminal G+R are unioned first so the SP
    # computes one partial aggregate over its whole share.
    sp_inputs: list[DataFrame] = []
    for stage, ddf in drains[: len(prefix) + (0 if gr is None else 1)]:
        cur = ddf
        for j in range(stage, len(prefix)):
            cur = prefix[j].apply(cur)
        sp_inputs.append(cur)

    if gr is not None:
        assert source_partial is not None
        sp_union = reduce(DataFrame.unionByName, sp_inputs)
        sp_partial = gr.partial(sp_union)
        result = gr.merge(source_partial.unionByName(sp_partial))
    else:
        # Pure stateless pipeline: final records are the union of the
        # source-processed share and every SP-finished drain path.
        parts = sp_inputs + ([local] if local is not None else [])
        result = reduce(DataFrame.unionByName, parts)

    # --- metrics --------------------------------------------------------------
    if collect_metrics:
        drained_counts = tuple(int(d.count()) for _, d in drains)
        # Taken records per op: input to op minus drained at its proxy.
        taken: list[int] = []
        inputs = df
        for i, op in enumerate(prefix):
            n_in = int(inputs.count())
            taken.append(n_in - drained_counts[i])
            inputs = op.apply(inputs.filter(_split_cond(i, float(p[i]), seed)))
        if gr is not None:
            n_in = int(inputs.count())
            taken.append(n_in - drained_counts[-1])
        sp_counts = tuple(int(s.count()) for s in sp_inputs)
        n_partial = int(source_partial.count()) if source_partial is not None else 0
    else:
        drained_counts = tuple([-1] * pipeline.n_ops)
        taken = [-1] * pipeline.n_ops
        sp_counts = tuple([-1] * len(sp_inputs))
        n_partial = -1

    return PartitionedRun(
        result=result,
        taken_counts=tuple(taken),
        drained_counts=drained_counts,
        source_partial_rows=n_partial,
        sp_input_counts=sp_counts,
    )


def drained_bytes(
    run: PartitionedRun, pipeline: Pipeline, *, drain_overhead: float = 1.0
) -> float:
    """Network bytes shipped by the drain paths of one window.

    Stage-0 drains are bulk forwards (no per-record framing); deeper
    drains pay ``drain_overhead`` for Kryo framing, the target-operator
    id and replicated watermarks (paper §V).
    """
    sizes = pipeline.stage_bytes
    total = 0.0
    for i, n in enumerate(run.drained_counts):
        oh = 1.0 if i == 0 else drain_overhead
        total += n * sizes[i] * oh
    return total
