"""WSP data-synopsis tests (Fig. 9 mechanics)."""
import pytest

from repro.synopsis.wsp import (
    ALERT_THRESHOLD_US,
    estimation_errors,
    evaluate_rate,
    wsp_sample,
)
from repro.workloads.pingmesh import pingmesh_trace


@pytest.fixture(scope="module")
def trace(spark):
    # Anomaly-heavy trace (the Fig. 9 scenario studies alert fidelity).
    df = pingmesh_trace(
        spark,
        n_sources=4,
        peers_per_source=40,
        n_windows=3,
        anomaly_pair_frac=0.3,
        seed=17,
    )
    df.cache().count()
    return df


class TestSampling:
    @pytest.mark.parametrize("rate", [0.0, 0.2, 0.5, 0.8, 1.0])
    def test_sample_fraction(self, trace, rate):
        n = trace.count()
        s = wsp_sample(trace, rate).count()
        assert s == pytest.approx(rate * n, abs=max(4, 0.05 * n))

    def test_deterministic(self, trace):
        a = wsp_sample(trace, 0.4, seed=1).count()
        b = wsp_sample(trace, 0.4, seed=1).count()
        assert a == b

    def test_invalid_rate(self, trace):
        with pytest.raises(ValueError):
            wsp_sample(trace, 1.5)

    def test_sample_is_subset(self, trace):
        ids = {r["record_id"] for r in wsp_sample(trace, 0.3).select("record_id").collect()}
        full = {r["record_id"] for r in trace.select("record_id").collect()}
        assert ids <= full


class TestEstimation:
    def test_full_rate_zero_error(self, trace):
        pdf = estimation_errors(trace, 1.0)
        assert (pdf["error_us"] == 0).all()

    def test_zero_rate_misses_everything(self, trace):
        pdf = estimation_errors(trace, 0.0)
        assert (pdf["est_max"] == 0).all()
        assert (pdf["error_us"] == pdf["true_max"]).all()

    def test_error_monotone_in_rate_on_average(self, trace):
        lo = estimation_errors(trace, 0.2)["error_us"].mean()
        hi = estimation_errors(trace, 0.8)["error_us"].mean()
        assert hi < lo


class TestFig9Claims:
    def test_high_rates_accurate_but_expensive(self, trace):
        """Paper: 0.6-0.8 sampling keeps 85-90% of errors within 1 ms but
        yields little bandwidth saving."""
        for rate in (0.6, 0.8):
            rep = evaluate_rate(trace, rate)
            assert rep.frac_err_within_1ms >= 0.80
            assert rep.bandwidth_frac >= 0.6  # no real saving

    def test_low_rates_cheap_but_inaccurate(self, trace):
        """Paper: 0.2-0.4 sampling saves bandwidth but misses 10-38% of
        alerts and pushes errors past the 5 ms threshold."""
        rep2 = evaluate_rate(trace, 0.2)
        rep4 = evaluate_rate(trace, 0.4)
        assert rep2.n_true_alerts > 10  # anomalies exist in the trace
        assert rep2.alert_miss_frac > 0.10
        assert rep4.alert_miss_frac > 0.05
        assert rep2.alert_miss_frac > rep4.alert_miss_frac
        assert rep2.frac_err_above_5ms > 0.0

    def test_jarvis_exactness_reference(self, trace):
        """Jarvis' counterpart: partitioned execution is exact (error 0)
        at any bandwidth — pinned by the oracle tests; here we just pin
        the WSP side: only rate=1.0 achieves zero misses."""
        rep = evaluate_rate(trace, 1.0)
        assert rep.n_missed_alerts == 0
        assert rep.frac_err_within_1ms == 1.0

    def test_alert_threshold_configurable(self, trace):
        rep = evaluate_rate(trace, 0.5, threshold_us=ALERT_THRESHOLD_US * 100)
        assert rep.n_true_alerts == 0
