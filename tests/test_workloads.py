"""Workload generator tests: Pingmesh and LogAnalytics traces."""
import numpy as np
import pandas as pd
import pytest

from repro.workloads.loganalytics import COMPLETE_RATE, log_trace_pandas
from repro.workloads.pingmesh import (
    ANOMALY_RTT_US,
    ERR_RATE,
    IP_DOMAIN,
    pingmesh_trace_pandas,
    tor_map_pandas,
)


class TestPingmesh:
    @pytest.fixture(scope="class")
    def trace(self):
        return pingmesh_trace_pandas(
            n_sources=8, peers_per_source=50, n_windows=4, seed=7
        )

    def test_schema(self, trace):
        assert list(trace.columns) == [
            "record_id", "source_id", "ts_s", "src_ip", "src_cluster",
            "dst_ip", "dst_cluster", "rtt_us", "err_code",
        ]

    def test_record_count(self, trace):
        # 2 probes per pair per 10s window.
        assert len(trace) == 8 * 50 * 4 * 2

    def test_record_ids_unique(self, trace):
        assert trace["record_id"].is_unique

    def test_deterministic_in_seed(self):
        a = pingmesh_trace_pandas(n_sources=2, peers_per_source=10, n_windows=2, seed=3)
        b = pingmesh_trace_pandas(n_sources=2, peers_per_source=10, n_windows=2, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seed_differs(self):
        a = pingmesh_trace_pandas(n_sources=2, peers_per_source=10, n_windows=2, seed=3)
        b = pingmesh_trace_pandas(n_sources=2, peers_per_source=10, n_windows=2, seed=4)
        assert not a["rtt_us"].equals(b["rtt_us"])

    def test_filter_out_rate_near_14pct(self, trace):
        """Paper: 'The filter predicate delivers 14% filter-out rate'."""
        rate = (trace["err_code"] != 0).mean()
        assert rate == pytest.approx(ERR_RATE, abs=0.02)

    def test_ips_within_domain(self, trace):
        assert trace["src_ip"].between(0, IP_DOMAIN - 1).all()
        assert trace["dst_ip"].between(0, IP_DOMAIN - 1).all()
        assert (trace["src_ip"] != trace["dst_ip"]).all()

    def test_timestamps_cover_windows(self, trace):
        assert set(trace["ts_s"] // 10) == set(range(4))

    def test_anomalies_present_and_sparse(self, trace):
        """Sparse 5-50 ms spikes against a sub-ms baseline (Fig. 9 setup)."""
        spikes = trace["rtt_us"] >= ANOMALY_RTT_US[0]
        assert 0.0 < spikes.mean() < 0.05
        base = trace.loc[~spikes, "rtt_us"]
        assert base.median() < 1_000  # baseline well under 1 ms

    def test_too_many_sources_rejected(self):
        with pytest.raises(ValueError):
            pingmesh_trace_pandas(n_sources=IP_DOMAIN + 1)

    def test_spark_roundtrip(self, spark):
        from repro.workloads.pingmesh import pingmesh_trace

        df = pingmesh_trace(spark, n_sources=2, peers_per_source=10, n_windows=2)
        assert df.count() == 2 * 10 * 2 * 2


class TestTorMap:
    def test_covers_ip_domain(self):
        m = tor_map_pandas(table_size=500)
        assert len(m) == 500
        assert m["ip"].is_unique

    def test_bigger_table_same_mapping(self):
        """A 10x table changes join cost, not semantics (Fig. 8b)."""
        small = tor_map_pandas(table_size=500)
        big = tor_map_pandas(table_size=5000)
        pd.testing.assert_frame_equal(big.iloc[:500], small)

    def test_too_small_rejected(self):
        with pytest.raises(ValueError):
            tor_map_pandas(table_size=100)


class TestLogTrace:
    @pytest.fixture(scope="class")
    def trace(self):
        return log_trace_pandas(
            n_sources=4, lines_per_source_window=100, n_windows=3, seed=11
        )

    def test_schema_and_count(self, trace):
        assert list(trace.columns) == ["record_id", "source_id", "ts_s", "line"]
        assert len(trace) == 4 * 100 * 3

    def test_deterministic(self):
        a = log_trace_pandas(n_sources=2, lines_per_source_window=20, n_windows=2)
        b = log_trace_pandas(n_sources=2, lines_per_source_window=20, n_windows=2)
        pd.testing.assert_frame_equal(a, b)

    def test_complete_rate(self, trace):
        rate = trace["line"].str.contains("status=JOB_COMPLETE").mean()
        assert rate == pytest.approx(COMPLETE_RATE, abs=0.05)

    def test_lines_parseable(self, trace):
        ten = trace["line"].str.extract(r"tenant=(\w+)")[0]
        lat = trace["line"].str.extract(r"latency_ms=([0-9.]+)")[0].astype(float)
        cpu = trace["line"].str.extract(r"cpu=([0-9.]+)")[0].astype(float)
        assert ten.notna().all() and lat.notna().all()
        assert (lat > 0).all()
        assert cpu.between(0, 100).all()

    def test_line_size_near_128B(self, trace):
        """Record-size calibration: ~128 B/line for the 49.6 Mbps rate."""
        mean_len = trace["line"].str.len().mean()
        assert 100 <= mean_len <= 150
