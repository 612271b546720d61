"""T-9 bench: regenerates the WSP-vs-Jarvis synopsis table (Fig. 9)."""
from repro.experiments.fig9 import run


def test_fig9_table(benchmark, spark):
    results = benchmark.pedantic(run, args=(spark,), rounds=1, iterations=1)
    wsp = {r["sampling_rate"]: r for r in results["wsp"]}
    # High rates accurate, low rates miss alerts (paper's trade-off).
    assert wsp[0.8]["err_within_1ms_frac"] >= 0.85
    assert wsp[0.2]["alert_miss_frac"] > 0.1
    # Jarvis rows always exact.
    assert all(r["alert_miss_frac"] == 0.0 for r in results["jarvis"])
