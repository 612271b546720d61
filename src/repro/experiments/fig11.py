"""T-11 (paper Fig. 11): multiple query instances per data source node."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.cluster.simulator import multi_query_sweep, saturation_point
from repro.experiments.specs import s2s_spec

#: (input scaling, per-query CPU demand) mirroring Fig. 10's settings.
PANELS = ((10, 0.55), (5, 0.30), (1, 0.05))


def run(spark: SparkSession) -> dict:
    base = s2s_spec(spark)
    sweeps = {}
    saturations = []
    for scale, budget in PANELS:
        spec = base.with_rate_scale(scale / 10.0)
        for cores in (1, 2):
            rows = multi_query_sweep(
                spec,
                list(range(1, 33)),
                cores=cores,
                per_query_budget_core=budget,
            )
            sweeps[f"{scale}x_{cores}core"] = rows
            saturations.append(
                {
                    "scale": f"{scale}x",
                    "cores": cores,
                    "saturation_queries": saturation_point(rows),
                    "aggregate_at_saturation_mbps": max(
                        r["aggregate_mbps"] for r in rows
                    ),
                }
            )
    return {"sweeps": sweeps, "saturations": saturations}
