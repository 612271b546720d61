"""Experiment-layer tests: report rendering and table structure."""
import pytest

from repro.experiments import fig8, opcount
from repro.experiments.report import (
    fig8_section,
    md_table,
    opcount_section,
)


class TestMdTable:
    def test_basic(self):
        s = md_table([{"a": 1, "b": "x"}, {"a": 2, "b": "y"}])
        assert "| a | b |" in s
        assert "| 1 | x |" in s
        assert s.count("\n") == 4

    def test_column_selection_and_order(self):
        s = md_table([{"a": 1, "b": 2}], ["b", "a"])
        assert s.splitlines()[0] == "| b | a |"

    def test_empty(self):
        assert "no rows" in md_table([])

    def test_missing_cell_blank(self):
        s = md_table([{"a": 1}], ["a", "b"])
        assert "| 1 |  |" in s


class TestFig8Experiment:
    @pytest.fixture(scope="class")
    def rows(self):
        return fig8.run()

    def test_covers_all_scenarios(self, rows):
        keys = {(r["query"], r["change"], r["mode"]) for r in rows}
        assert len(keys) == 3 * 2 * 3  # 3 queries x 2 changes x 3 modes

    def test_jarvis_always_converges(self, rows):
        for r in rows:
            if r["mode"] == "jarvis":
                assert isinstance(r["epochs_after_detect"], int)
                assert r["epochs_after_detect"] <= 7  # paper: within 7 s

    def test_lp_only_diverges_where_paper_says(self, rows):
        by = {(r["query"], r["change"]): r["epochs_after_detect"]
              for r in rows if r["mode"] == "lp_only"}
        assert by[("s2s", "90%->60% CPU")] == "no-conv"
        assert by[("t2t", "10%->100% CPU")] == "no-conv"

    def test_section_renders(self, rows):
        s = fig8_section(rows)
        assert "T-8" in s and "no-conv" in s


class TestOpcount:
    def test_section_renders(self):
        rows = [{"n_ops": 2, "worst_epochs": 9, "mean_epochs": 5.0, "n_configs": 10}]
        s = opcount_section(rows)
        assert "worst_epochs" in s


class TestSpecMeasurement:
    def test_measured_spec_matches_calibration(self, spark):
        """Spark-measured relay ratios must land near the calibrated
        constants the convergence experiments use."""
        from repro.experiments.specs import s2s_spec

        spec = s2s_spec(spark)
        assert spec.relay[0] == pytest.approx(1.0)
        assert spec.relay[1] == pytest.approx(0.86, abs=0.04)
        assert spec.relay[2] < 0.1  # ~20 probes per pair-window at 10x
        assert spec.full_demand_core(26.2) == pytest.approx(0.85, abs=0.03)

    def test_rate_scale_preserves_group_population(self, spark):
        from repro.experiments.specs import s2s_spec

        spec = s2s_spec(spark)
        half = spec.with_rate_scale(0.5)
        assert half.offered_mbps == pytest.approx(spec.offered_mbps / 2)
        # Output per window constant => bytes/record doubles.
        assert half.output_bytes_per_record == pytest.approx(
            2 * spec.output_bytes_per_record
        )
