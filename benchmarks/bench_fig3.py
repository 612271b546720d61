"""T-3 bench: regenerates the operator-level vs data-level table (Fig. 3)."""
from repro.experiments.fig3 import run


def test_fig3_table(benchmark, spark):
    rows = benchmark.pedantic(run, args=(spark,), rounds=1, iterations=1)
    assert len(rows) == 3
    by_plan = {r["plan"]: r for r in rows}
    op = by_plan["operator-level (Best-OP@80%)"]
    dl = by_plan["data-level (paper plan p_GR=0.83)"]
    lp = by_plan["data-level (Eq.3 LP plan)"]
    # Paper's 2.4x traffic reduction: data-level must ship far less.
    assert op["model_traffic_mbps"] / dl["model_traffic_mbps"] > 2.0
    assert lp["model_traffic_mbps"] <= dl["model_traffic_mbps"]
