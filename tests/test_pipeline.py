"""Pipeline validation (rules R-1..R-4) and model-vector tests."""
import numpy as np
import pytest

from repro.core.operators import (
    StatelessOp,
    UnsupportedOperatorError,
    filter_op,
    group_reduce_op,
    window_op,
)
from repro.core.pipeline import Pipeline
from repro.workloads.queries import log_pipeline, s2s_pipeline


def gr(**kw):
    return group_reduce_op(
        ["window_id"], {"n": ("count", None)}, cost_us=5.0, input_bytes=10, **kw
    )


class TestValidation:
    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            Pipeline(name="x", ops=())

    def test_group_reduce_must_be_terminal(self):
        """Rule R-2: no operators downstream of a stateful G+R."""
        f = filter_op("1 = 1", cost_us=1.0, input_bytes=10)
        with pytest.raises(UnsupportedOperatorError, match="R-2"):
            Pipeline(name="x", ops=(gr(), f))

    def test_stream_join_rejected(self):
        """Rule R-3: stream-stream joins unsupported."""
        sj = StatelessOp(
            name="SJ", kind="stream_join", cost_us=1.0, input_bytes=10,
            fn=lambda df: df,
        )
        with pytest.raises(UnsupportedOperatorError, match="R-3"):
            Pipeline(name="x", ops=(sj,))

    def test_parallelism_rejected(self):
        """Rule R-4: one physical operator per logical operator."""
        f = filter_op("1 = 1", cost_us=1.0, input_bytes=10)
        with pytest.raises(UnsupportedOperatorError, match="R-4"):
            Pipeline(name="x", ops=(f,), max_parallelism=4)

    def test_pure_stateless_pipeline_allowed(self):
        f = filter_op("1 = 1", cost_us=1.0, input_bytes=10)
        pl = Pipeline(name="x", ops=(f,))
        assert pl.terminal_group_reduce is None
        assert len(pl.stateless_prefix) == 1


class TestStructure:
    def test_s2s_shape(self):
        pl = s2s_pipeline()
        assert pl.n_ops == 3
        assert [o.name for o in pl.ops] == ["W", "F", "G+R"]
        assert len(pl.stateless_prefix) == 2
        assert pl.terminal_group_reduce is not None

    def test_cost_and_bytes_vectors(self):
        pl = s2s_pipeline()
        assert pl.cost_us == pytest.approx([0.2, 3.4, 22.0])
        assert pl.stage_bytes == pytest.approx([86.0, 86.0, 86.0])

    def test_log_shape(self):
        pl = log_pipeline()
        assert [o.name for o in pl.ops] == ["W", "F", "M", "G+R"]
        # The parse shrinks records ~3x: drains after M are cheaper.
        assert pl.stage_bytes[3] < pl.stage_bytes[2]


class TestMeasuredRelay(object):
    def test_s2s_relay_measured_from_data(self, spark):
        from repro.workloads.queries import s2s_query

        b = s2s_query(spark, n_sources=2, peers_per_source=30, n_windows=2)
        r = b.pipeline.measure_relay_ratios(b.input_df)
        assert r.shape == (3,)
        assert r[0] == pytest.approx(1.0)  # window drops nothing
        # Filter keeps ~86% (err rate 14%).
        assert 0.75 <= r[1] <= 0.95
        # Grouping reduces heavily (2 probes per pair per window).
        assert r[2] < 0.8

    def test_window_relay_is_one(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame({"record_id": range(10), "ts_s": range(10)})
        )
        pl = Pipeline(
            name="w", ops=(window_op(cost_us=0.1, input_bytes=8),)
        )
        assert pl.measure_relay_ratios(df) == pytest.approx([1.0])

    def test_empty_input_relay_defaults_to_one(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame({"record_id": [1], "ts_s": [1]})
        ).filter("record_id < 0")
        pl = Pipeline(name="w", ops=(window_op(cost_us=0.1, input_bytes=8),))
        assert pl.measure_relay_ratios(df) == pytest.approx([1.0])
