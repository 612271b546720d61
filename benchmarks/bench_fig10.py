"""T-10 bench: regenerates the multi-source scaling table (Fig. 10)."""
from repro.experiments.fig10 import run


def test_fig10_table(benchmark, spark):
    results = benchmark.pedantic(run, args=(spark,), rounds=1, iterations=1)
    sup = {r["scale"]: r for r in results["supported"]}
    # Paper: Jarvis handles up to 75% more sources than Best-OP.
    assert sup["5x"]["jarvis_max_sources"] >= 1.75 * sup["5x"]["bestop_max_sources"]
    assert sup["1x"]["jarvis_max_sources"] >= 250
    lat = {(r["strategy"], r["n_sources"]): r for r in results["latency"]}
    assert lat[("Best-OP", 60)]["max_latency_s"] >= 60
    assert lat[("Jarvis", 60)]["max_latency_s"] < 5
