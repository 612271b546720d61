"""T-7 bench: regenerates the throughput-vs-budget tables (Fig. 7)."""
from repro.experiments.fig7 import pivot, run


def test_fig7_tables(benchmark, spark):
    results = benchmark.pedantic(run, args=(spark,), rounds=1, iterations=1)
    assert set(results) == {"s2s", "t2t", "log"}
    # Jarvis tops every query at the paper's highlighted budgets.
    for q, budget in (("s2s", 60), ("t2t", 60), ("log", 40)):
        t = pivot(results[q])[budget]
        assert t["Jarvis"] == max(t.values())
