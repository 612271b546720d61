"""EXPERIMENTS.md builder: paper numbers next to measured numbers.

Each section renders one evaluation table (T-3 .. T-11) from the
corresponding ``repro.experiments.figN.run()`` output, with the paper's
reported values quoted alongside so a reader can diff shapes directly.
Regenerate with ``python jobs/build_experiments_md.py``.
"""
from __future__ import annotations

from typing import Iterable


def md_table(rows: Iterable[dict], cols: list[str] | None = None) -> str:
    rows = list(rows)
    if not rows:
        return "_(no rows)_\n"
    cols = cols or list(rows[0].keys())
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        out.append("| " + " | ".join(str(r.get(c, "")) for c in cols) + " |")
    return "\n".join(out) + "\n"


def fig7_section(results: dict[str, list[dict]]) -> str:
    from repro.experiments.fig7 import pivot

    names = {"s2s": "S2SProbe", "t2t": "T2TProbe (table=500)", "log": "LogAnalytics"}
    parts = ["## T-7 — Query throughput vs CPU budget (Fig. 7)\n"]
    parts.append(
        "Throughput in Mbps of input sustained within the latency bound; "
        "per-query network allowance 20.48 Mbps.\n"
    )
    for key, title in names.items():
        pv = pivot(results[key])
        strategies = sorted(next(iter(pv.values())).keys())
        rows = [
            {"CPU %": b, **{s: pv[b][s] for s in strategies}}
            for b in sorted(pv.keys())
        ]
        parts.append(f"### {title}\n")
        parts.append(md_table(rows, ["CPU %"] + strategies))

        def ratio(b: int, a: str, c: str) -> float:
            return round(pv[b][a] / pv[b][c], 2)

        if key == "s2s":
            parts.append(
                "\n| claim | paper | ours |\n|---|---|---|\n"
                f"| Jarvis / All-Src @60% | 2.6x | {ratio(60,'Jarvis','All-Src')}x |\n"
                f"| Jarvis / LB-DP @60% | 1.16x | {ratio(60,'Jarvis','LB-DP')}x |\n"
                f"| Jarvis / Best-OP @80% | 1.25x | {ratio(80,'Jarvis','Best-OP')}x |\n"
            )
        elif key == "t2t":
            parts.append(
                "\n| claim | paper | ours |\n|---|---|---|\n"
                f"| Jarvis / All-Src @40% | 4.4x | {ratio(40,'Jarvis','All-Src')}x |\n"
                f"| Jarvis / Best-OP @60-100% | 1.2x | "
                f"{ratio(60,'Jarvis','Best-OP')}-{ratio(100,'Jarvis','Best-OP')}x |\n"
            )
        else:
            parts.append(
                "\n| claim | paper | ours |\n|---|---|---|\n"
                f"| Jarvis / All-SP @40-100% | 2.3x | {ratio(60,'Jarvis','All-SP')}x |\n"
                f"| Jarvis / Best-OP @20% | 1.5x | {ratio(20,'Jarvis','Best-OP')}x |\n"
                f"| Jarvis / LB-DP @20% | 1.5x | {ratio(20,'Jarvis','LB-DP')}x |\n"
            )
        parts.append("")
    return "\n".join(parts)


_FIG8_PAPER = {
    ("s2s", "10%->90% CPU"): {"jarvis": "1", "no_lp": "6", "lp_only": "converges"},
    ("s2s", "90%->60% CPU"): {"jarvis": "2", "no_lp": "4", "lp_only": "no-conv"},
    ("t2t", "10%->100% CPU"): {"jarvis": "7", "no_lp": "11", "lp_only": "no-conv"},
    ("t2t", "table x10"): {"jarvis": "3", "no_lp": "5", "lp_only": "no-conv"},
    ("log", "5%->30% CPU"): {"jarvis": "(same trend as S2S)", "no_lp": "", "lp_only": ""},
    ("log", "30%->15% CPU"): {"jarvis": "", "no_lp": "", "lp_only": ""},
}


def fig8_section(rows: list[dict]) -> str:
    parts = [
        "## T-8 — Convergence after resource changes (Fig. 8)\n",
        "Non-stable epochs after the 3-epoch detection delay (1 s epochs). "
        "`no-conv` = never restabilizes within 40 epochs.\n",
    ]
    table = {}
    for r in rows:
        table.setdefault((r["query"], r["change"]), {})[r["mode"]] = r[
            "epochs_after_detect"
        ]
    out_rows = []
    for (q, change), modes in table.items():
        paper = _FIG8_PAPER.get((q, change), {})
        out_rows.append(
            {
                "query": q,
                "change": change,
                "Jarvis (ours)": modes.get("jarvis"),
                "Jarvis (paper)": paper.get("jarvis", "-"),
                "w/o LP-init (ours)": modes.get("no_lp"),
                "w/o LP-init (paper)": paper.get("no_lp", "-"),
                "LP-only (ours)": modes.get("lp_only"),
                "LP-only (paper)": paper.get("lp_only", "-"),
            }
        )
    parts.append(md_table(out_rows))
    return "\n".join(parts)


def fig9_section(results: dict) -> str:
    parts = [
        "## T-9 — Data synopsis (WSP sampling) vs Jarvis (Fig. 9)\n",
        "Paper: sampling at 0.6-0.8 keeps 85-90% of errors within 1 ms but "
        "saves little bandwidth; at 0.2-0.4 it saves bandwidth (10-32% of "
        "input) but 20-40% of errors exceed 1 ms, 20% exceed 5 ms at rate "
        "0.2, and 10-38% of alerts are missed. Jarvis transfers 11.4-90% of "
        "the input with zero error.\n",
        "### WSP (ours)\n",
        md_table(results["wsp"]),
        "_Deviation note: our synthetic windows hold ~2 probes per pair, "
        "so a missed anomaly usually means both records were dropped — "
        "alert-miss fractions at low rates run higher than the paper's "
        "10-38% (their production windows contain more probes per pair). "
        "The trade-off shape — accuracy falls exactly as bandwidth savings "
        "grow — is the reproduced result._\n",
        "### Jarvis drain traffic across budgets (ours; exact results "
        "always — oracle-pinned)\n",
        md_table(results["jarvis"]),
    ]
    return "\n".join(parts)


def fig10_section(results: dict) -> str:
    paper_supported = [
        {"scale": "10x", "jarvis (paper)": 32, "bestop (paper)": "degrades immediately"},
        {"scale": "5x", "jarvis (paper)": 70, "bestop (paper)": 40},
        {"scale": "1x", "jarvis (paper)": ">=250", "bestop (paper)": 180},
    ]
    merged = []
    for ours, paper in zip(results["supported"], paper_supported):
        merged.append(
            {
                "scale": ours["scale"],
                "CPU %": ours["budget_pct"],
                "Jarvis max sources (ours)": ours["jarvis_max_sources"],
                "Jarvis (paper)": paper["jarvis (paper)"],
                "Best-OP max sources (ours)": ours["bestop_max_sources"],
                "Best-OP (paper)": paper["bestop (paper)"],
            }
        )
    parts = [
        "## T-10 — Multi-source scaling on one SP link (Fig. 10)\n",
        "Max sources sustained at full rate (shared 460 Mbps SP link):\n",
        md_table(merged),
        "\nLatency at 5x rate (paper: Jarvis median 0.5 s / max 2 s; "
        "Best-OP median 1.8 s / max 5 s at 40 sources, >60 s at 60):\n",
        md_table(
            results["latency"],
            ["strategy", "n_sources", "per_source_mbps", "aggregate_mbps",
             "rho", "median_latency_s", "max_latency_s"],
        ),
        "\nFull aggregate-throughput sweeps:\n",
    ]
    for scale, rows in results["sweeps"].items():
        parts.append(f"### {scale} input rate\n")
        parts.append(
            md_table(rows, ["strategy", "n_sources", "per_source_mbps", "aggregate_mbps"])
        )
    return "\n".join(parts)


def fig11_section(results: dict) -> str:
    paper = {("10x", 1): 2, ("10x", 2): 3, ("5x", 1): 4, ("5x", 2): 6,
             ("1x", 1): 15, ("1x", 2): 25}
    rows = []
    for r in results["saturations"]:
        rows.append(
            {
                "scale": r["scale"],
                "cores": r["cores"],
                "saturation Q (ours)": r["saturation_queries"],
                "saturation Q (paper)": paper[(r["scale"], r["cores"])],
                "aggregate at saturation (Mbps)": r["aggregate_at_saturation_mbps"],
            }
        )
    return "\n".join(
        [
            "## T-11 — Multiple queries per data source node (Fig. 11)\n",
            "Q at which aggregate throughput saturates (fair CPU sharing, "
            "pinned per-query load factors, 1.5% runtime overhead/query):\n",
            md_table(rows),
        ]
    )


def fig3_section(rows: list[dict]) -> str:
    return "\n".join(
        [
            "## T-3 — Operator-level vs data-level partitioning @80% CPU (Fig. 3)\n",
            "Paper: operator-level ships 22.5 Mbps (F reduces little); "
            "data-level runs G+R on 83% of its input and ships 9.4 Mbps "
            "(2.4x less). Ours adds the Eq. 3 LP plan, which drains raw "
            "records upstream instead and ships even less.\n",
            md_table(rows),
        ]
    )


def opcount_section(rows: list[dict]) -> str:
    return "\n".join(
        [
            "## T-8d — Convergence cost vs operator count (exhaustive sweep)\n",
            "Paper: worst case grows to ~21 epochs at 4 operators (why the "
            "LP initialisation is worth having). Model-agnostic search from "
            "zero load factors, 3-epoch detection excluded:\n",
            md_table(rows),
        ]
    )
