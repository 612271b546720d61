"""T-7 (paper Fig. 7): query throughput vs CPU budget, six strategies."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.cluster.simulator import budget_sweep
from repro.experiments.specs import all_strategies, log_spec, s2s_spec, t2t_spec

BUDGETS = [0.2, 0.4, 0.6, 0.8, 1.0]


def run(spark: SparkSession) -> dict[str, list[dict]]:
    """Rows per query: throughput/traffic per (budget, strategy)."""
    specs = {
        "s2s": s2s_spec(spark),
        "t2t": t2t_spec(spark, table_size=500),
        "log": log_spec(spark),
    }
    return {
        name: budget_sweep(spec, all_strategies(), BUDGETS)
        for name, spec in specs.items()
    }


def pivot(rows: list[dict]) -> dict[int, dict[str, float]]:
    """budget_pct -> {strategy: throughput} for table rendering."""
    out: dict[int, dict[str, float]] = {}
    for r in rows:
        out.setdefault(r["budget_pct"], {})[r["strategy"]] = r["throughput_mbps"]
    return out
