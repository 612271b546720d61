"""T-8 bench: regenerates the convergence table (Fig. 8)."""
from repro.experiments.fig8 import run


def test_fig8_table(benchmark):
    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    by = {(r["query"], r["change"], r["mode"]): r["epochs_after_detect"] for r in rows}
    # Paper's headline orderings.
    assert by[("s2s", "10%->90% CPU", "jarvis")] <= by[("s2s", "10%->90% CPU", "no_lp")]
    assert by[("s2s", "90%->60% CPU", "lp_only")] == "no-conv"
    assert by[("t2t", "10%->100% CPU", "lp_only")] == "no-conv"
    assert all(
        isinstance(by[(q, c, "jarvis")], int)
        for q, c, m in by
        if m == "jarvis"
        for _ in [0]
    )
