"""Window-based sampling protocol (WSP) — the data-synopsis comparator.

The paper (§VI-D) contrasts Jarvis with continuous sampling from
distributed streams [Cormode et al.]: each data source ships a uniform
sample of its window to the stream processor, trading accuracy for
bandwidth.  Implemented here as a deterministic per-record Bernoulli
sample in Spark, with the paper's two accuracy views:

* **estimation error** — per (window, server pair), the error in the
  estimated probe-latency range (we use the max-RTT estimate, the
  quantity the 5 ms alert threshold reads); a pair with no sampled
  records is a complete miss (error = its true max);
* **alert analysis** — a true alert is a pair-window whose max RTT
  exceeds the threshold; WSP detects it only if a spiking record is
  sampled.

Bandwidth is simply the sampling rate (the sample ships verbatim).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Alert threshold: "probe latencies exceeding a threshold such as 5 ms".
ALERT_THRESHOLD_US = 5_000.0

_BUCKETS = 1_000_000


def wsp_sample(df: DataFrame, rate: float, *, seed: int = 0) -> DataFrame:
    """Deterministic Bernoulli(rate) sample of a probe stream."""
    if not 0.0 <= rate <= 1.0:
        raise ValueError("sampling rate must lie in [0, 1]")
    h = F.pmod(F.xxhash64(F.col("record_id"), F.lit(seed)), F.lit(_BUCKETS))
    return df.filter(h < F.lit(int(round(rate * _BUCKETS))))


def _pair_max(df: DataFrame, out: str) -> DataFrame:
    return (
        df.withColumn("window_id", F.floor(F.col("ts_s") / 10).cast("long"))
        .filter("err_code = 0")
        .groupBy("window_id", "src_ip", "dst_ip")
        .agg(F.max("rtt_us").alias(out))
    )


@dataclass(frozen=True)
class WSPReport:
    """Accuracy/bandwidth summary for one sampling rate."""

    rate: float
    bandwidth_frac: float
    frac_err_within_1ms: float
    frac_err_above_5ms: float
    n_true_alerts: int
    n_missed_alerts: int

    @property
    def alert_miss_frac(self) -> float:
        return self.n_missed_alerts / self.n_true_alerts if self.n_true_alerts else 0.0


def estimation_errors(df: DataFrame, rate: float, *, seed: int = 0) -> pd.DataFrame:
    """Per pair-window max-RTT estimation error of WSP at ``rate``.

    Returns a pandas frame with columns ``true_max, est_max, error_us``
    (``est_max`` is 0 for completely missed pairs, per a consumer that
    sees no data for the pair).
    """
    truth = _pair_max(df, "true_max")
    est = _pair_max(wsp_sample(df, rate, seed=seed), "est_max")
    joined = truth.join(est, ["window_id", "src_ip", "dst_ip"], "left").select(
        "window_id",
        "src_ip",
        "dst_ip",
        "true_max",
        F.coalesce("est_max", F.lit(0.0)).alias("est_max"),
    )
    pdf = joined.toPandas()
    pdf["error_us"] = (pdf["true_max"] - pdf["est_max"]).abs()
    return pdf


def evaluate_rate(
    df: DataFrame,
    rate: float,
    *,
    seed: int = 0,
    threshold_us: float = ALERT_THRESHOLD_US,
) -> WSPReport:
    """Full Fig. 9 metrics for one sampling rate."""
    pdf = estimation_errors(df, rate, seed=seed)
    true_alerts = pdf["true_max"] > threshold_us
    detected = pdf["est_max"] > threshold_us
    missed = true_alerts & ~detected
    return WSPReport(
        rate=rate,
        bandwidth_frac=rate,
        frac_err_within_1ms=float((pdf["error_us"] <= 1_000.0).mean()),
        frac_err_above_5ms=float((pdf["error_us"] > 5_000.0).mean()),
        n_true_alerts=int(true_alerts.sum()),
        n_missed_alerts=int(missed.sum()),
    )
