"""T-10 (paper Fig. 10): multi-source scaling over a shared SP link."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.cluster.simulator import (
    max_supported_sources,
    multi_source_sweep,
)
from repro.experiments.specs import s2s_spec
from repro.strategies.best_op import BestOp
from repro.strategies.jarvis import Jarvis

#: (input scaling, CPU budget) per the paper's three panels.
PANELS = ((10, 0.55), (5, 0.30), (1, 0.05))
SOURCES = (10, 20, 32, 40, 60, 70, 100, 150, 180, 250)


def run(spark: SparkSession) -> dict:
    base = s2s_spec(spark)
    sweeps = {}
    supported = []
    for scale, budget in PANELS:
        spec = base.with_rate_scale(scale / 10.0)
        rows = multi_source_sweep(
            spec, [Jarvis(), BestOp()], list(SOURCES), budget_core=budget
        )
        sweeps[f"{scale}x"] = [r.__dict__ for r in rows]
        supported.append(
            {
                "scale": f"{scale}x",
                "budget_pct": round(budget * 100),
                "jarvis_max_sources": max_supported_sources(
                    spec, Jarvis(), budget_core=budget
                ),
                "bestop_max_sources": max_supported_sources(
                    spec, BestOp(), budget_core=budget
                ),
            }
        )
    # Latency panel: 5x rate, 40 and 60 sources (paper's §VI-E numbers).
    spec5 = base.with_rate_scale(0.5)
    latency = [
        r.__dict__
        for r in multi_source_sweep(
            spec5, [Jarvis(), BestOp()], [40, 60], budget_core=0.30
        )
    ]
    return {"sweeps": sweeps, "supported": supported, "latency": latency}
