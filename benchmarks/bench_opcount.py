"""T-8d bench: regenerates the convergence-vs-operator-count sweep."""
from repro.experiments.opcount import run


def test_opcount_table(benchmark):
    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    worst = {r["n_ops"]: r["worst_epochs"] for r in rows}
    assert worst[2] <= worst[3] <= worst[4]
    assert worst[4] >= 15  # paper: up to 21 epochs with four operators
