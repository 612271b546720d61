"""Stream operators as Spark DataFrame transformations.

The paper's queries are chains of W(indow), F(ilter), M(ap), J(oin with
a static table) and G+R (windowed group + reduce).  Each operator here
carries:

* its *logical semantics* as a ``DataFrame -> DataFrame`` transformation
  (the Catalyst-optimized DataFrame API — no RDDs), and
* the metadata the partitioning algorithms need (kind, per-record model
  cost, wire size of its input records).

Stateful G+R exposes the incremental ``partial`` / ``merge`` split that
makes data-level partitioning lossless: partial aggregates computed on
the data source merge with partial aggregates computed on the stream
processor (paper §IV-B rule R-1: only incrementally-updatable
aggregations are supported near data).

Every stateless operator must preserve the ``record_id`` column — the
control proxies hash it to split records deterministically.
"""
from __future__ import annotations

from collections.abc import Callable
from dataclasses import dataclass, field

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

#: Column every stateless operator must carry through (proxy split key).
RECORD_ID = "record_id"

#: Aggregations that are incrementally updatable (mergeable) — rule R-1.
MERGEABLE_AGGS = frozenset({"count", "sum", "min", "max", "avg"})


class UnsupportedOperatorError(ValueError):
    """Raised when a pipeline violates the paper's pushdown rules R-1..R-3."""


@dataclass(frozen=True)
class AggSpec:
    """One output aggregate: ``kind`` over input column ``col``.

    ``col`` is ignored for ``count`` (count of records in the group).
    """

    kind: str
    col: str | None = None

    def __post_init__(self) -> None:
        if self.kind not in MERGEABLE_AGGS:
            raise UnsupportedOperatorError(
                f"aggregation '{self.kind}' is not incrementally updatable "
                "(rule R-1); use a mergeable aggregate (count/sum/min/max/avg)"
            )
        if self.kind != "count" and not self.col:
            raise ValueError(f"aggregation '{self.kind}' requires a column")


@dataclass(frozen=True)
class Operator:
    """Base stream operator.

    Attributes:
        name: display name (W, F, J, P, M, G+R, ...).
        kind: one of window/filter/map/static_join/group_reduce/stream_join.
        cost_us: modelled per-record compute cost (µs of one core).
        input_bytes: wire size of one record arriving at this operator —
            what a drain at this operator's control proxy ships.
    """

    name: str
    kind: str
    cost_us: float
    input_bytes: float

    @property
    def is_stateless(self) -> bool:
        return self.kind in ("window", "filter", "map", "static_join")


@dataclass(frozen=True)
class StatelessOp(Operator):
    """Stateless operator defined by a DataFrame transformation."""

    fn: Callable[[DataFrame], DataFrame] = field(default=lambda df: df)

    def apply(self, df: DataFrame) -> DataFrame:
        out = self.fn(df)
        if RECORD_ID not in out.columns:
            raise ValueError(
                f"operator {self.name} dropped the '{RECORD_ID}' column; "
                "stateless operators must preserve it for proxy splitting"
            )
        return out


def window_op(*, ts_col: str = "ts_s", window_s: int = 10, cost_us: float,
              input_bytes: float) -> StatelessOp:
    """Tumbling-window assignment: adds ``window_id = floor(ts/window)``."""
    def fn(df: DataFrame) -> DataFrame:
        return df.withColumn(
            "window_id", F.floor(F.col(ts_col) / F.lit(window_s)).cast("long")
        )

    return StatelessOp(
        name="W", kind="window", cost_us=cost_us, input_bytes=input_bytes, fn=fn
    )


def filter_op(condition: str, *, cost_us: float, input_bytes: float,
              name: str = "F") -> StatelessOp:
    """Predicate filter from a SQL boolean expression."""
    return StatelessOp(
        name=name,
        kind="filter",
        cost_us=cost_us,
        input_bytes=input_bytes,
        fn=lambda df: df.filter(F.expr(condition)),
    )


def map_op(exprs: dict[str, str], *, cost_us: float, input_bytes: float,
           name: str = "M") -> StatelessOp:
    """Projection / user-defined transformation.

    ``exprs`` maps output column name -> SQL expression over the input;
    ``record_id`` is carried through automatically.
    """
    def fn(df: DataFrame) -> DataFrame:
        cols: list[Column] = [F.col(RECORD_ID)]
        cols += [F.expr(e).alias(n) for n, e in exprs.items()]
        return df.select(*cols)

    return StatelessOp(
        name=name, kind="map", cost_us=cost_us, input_bytes=input_bytes, fn=fn
    )


def static_join_op(fn: Callable[[DataFrame], DataFrame], *, cost_us: float,
                   input_bytes: float, name: str = "J") -> StatelessOp:
    """Join of the stream with a *static* table (rule R-3 allows these).

    ``fn`` closes over the static table DataFrame. Stream-stream joins
    are rejected at pipeline construction (see ``Pipeline``).
    """
    return StatelessOp(
        name=name, kind="static_join", cost_us=cost_us, input_bytes=input_bytes, fn=fn
    )


@dataclass(frozen=True)
class GroupReduce(Operator):
    """Windowed group-by + incrementally-mergeable reductions.

    ``partial`` computes mergeable partial aggregates on any subset of
    the input; ``merge`` combines partial-aggregate rows (from the data
    source and the stream processor) into the final result — the pair
    satisfies ``merge(partial(A) ∪ partial(B)) == apply(A ∪ B)`` for any
    disjoint record sets A, B, which is exactly what makes Jarvis'
    data-level partitioning lossless.
    """

    keys: tuple[str, ...] = ()
    aggs: tuple[tuple[str, AggSpec], ...] = ()

    def _partial_exprs(self) -> list[Column]:
        cols: list[Column] = []
        for out, spec in self.aggs:
            if spec.kind == "count":
                cols.append(F.count(F.lit(1)).alias(f"__{out}_cnt"))
            elif spec.kind == "sum":
                cols.append(F.sum(spec.col).alias(f"__{out}_sum"))
            elif spec.kind == "min":
                cols.append(F.min(spec.col).alias(f"__{out}_min"))
            elif spec.kind == "max":
                cols.append(F.max(spec.col).alias(f"__{out}_max"))
            elif spec.kind == "avg":
                cols.append(F.sum(spec.col).alias(f"__{out}_sum"))
                cols.append(F.count(spec.col).alias(f"__{out}_cnt"))
        return cols

    def partial(self, df: DataFrame) -> DataFrame:
        """Partial (mergeable) aggregates of ``df`` per group."""
        return df.groupBy(*self.keys).agg(*self._partial_exprs())

    def merge(self, partials: DataFrame) -> DataFrame:
        """Merge partial-aggregate rows into the final query output."""
        merge_cols: list[Column] = []
        final_cols: list[Column] = [F.col(k) for k in self.keys]
        seen: set[str] = set()
        for out, spec in self.aggs:
            if spec.kind == "count":
                merge_cols.append(F.sum(f"__{out}_cnt").alias(f"__{out}_cnt"))
                final_cols.append(F.col(f"__{out}_cnt").alias(out))
            elif spec.kind == "sum":
                merge_cols.append(F.sum(f"__{out}_sum").alias(f"__{out}_sum"))
                final_cols.append(F.col(f"__{out}_sum").alias(out))
            elif spec.kind == "min":
                merge_cols.append(F.min(f"__{out}_min").alias(f"__{out}_min"))
                final_cols.append(F.col(f"__{out}_min").alias(out))
            elif spec.kind == "max":
                merge_cols.append(F.max(f"__{out}_max").alias(f"__{out}_max"))
                final_cols.append(F.col(f"__{out}_max").alias(out))
            elif spec.kind == "avg":
                for suffix in ("sum", "cnt"):
                    col = f"__{out}_{suffix}"
                    if col not in seen:
                        merge_cols.append(F.sum(col).alias(col))
                        seen.add(col)
                final_cols.append(
                    (F.col(f"__{out}_sum") / F.col(f"__{out}_cnt")).alias(out)
                )
        merged = partials.groupBy(*self.keys).agg(*merge_cols)
        return merged.select(*final_cols)

    def apply(self, df: DataFrame) -> DataFrame:
        """Full (unpartitioned) semantics — reference for the oracle."""
        return self.merge(self.partial(df))

    def direct(self, df: DataFrame) -> DataFrame:
        """Single-aggregation form of ``apply`` (one groupBy).

        Semantically identical to ``apply`` but with no chained
        aggregation — required by Structured Streaming, where stacked
        stateful operators trip the global-watermark correctness check.
        Spark's own pre-shuffle partial hash aggregation provides the
        source-side partial step in that setting.
        """
        cols: list[Column] = []
        for out, spec in self.aggs:
            if spec.kind == "count":
                cols.append(F.count(F.lit(1)).alias(out))
            elif spec.kind == "sum":
                cols.append(F.sum(spec.col).alias(out))
            elif spec.kind == "min":
                cols.append(F.min(spec.col).alias(out))
            elif spec.kind == "max":
                cols.append(F.max(spec.col).alias(out))
            elif spec.kind == "avg":
                cols.append(F.avg(spec.col).alias(out))
        return df.groupBy(*self.keys).agg(*cols)


def group_reduce_op(keys: list[str], aggs: dict[str, tuple[str, str | None]], *,
                    cost_us: float, input_bytes: float,
                    name: str = "G+R") -> GroupReduce:
    """Build a G+R operator from ``{out_col: (kind, in_col)}``."""
    specs = tuple((out, AggSpec(kind, col)) for out, (kind, col) in aggs.items())
    return GroupReduce(
        name=name,
        kind="group_reduce",
        cost_us=cost_us,
        input_bytes=input_bytes,
        keys=tuple(keys),
        aggs=specs,
    )
