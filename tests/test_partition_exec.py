"""The central correctness property of the reproduction:

    For ANY load-factor vector p, the merged output of the data-level
    partitioned execution equals the unpartitioned query — verified
    against DuckDB, not against Spark itself.

This is the paper's accuracy claim versus data synopses (§VI-D): query
partitioning reduces network traffic *without* touching the result.
"""
import numpy as np
import pytest

from repro.core.partition_exec import drained_bytes, run_partitioned
from repro.oracle import assert_equivalent
from repro.workloads.queries import log_query, s2s_query, t2t_query


@pytest.fixture(scope="module")
def s2s(spark):
    b = s2s_query(spark, n_sources=3, peers_per_source=25, n_windows=2)
    b.input_df.cache().count()
    return b


@pytest.fixture(scope="module")
def t2t(spark):
    b = t2t_query(spark, n_sources=3, peers_per_source=25, n_windows=2)
    b.input_df.cache().count()
    return b


@pytest.fixture(scope="module")
def logq(spark):
    b = log_query(spark, n_sources=3, lines_per_source_window=60, n_windows=2)
    b.input_df.cache().count()
    return b


class TestOracleEquivalenceS2S:
    @pytest.mark.parametrize(
        "p",
        [
            [0.0, 0.0, 0.0],  # All-SP
            [1.0, 1.0, 1.0],  # All-Src
            [1.0, 1.0, 0.0],  # Filter-Src-like (drain all G+R input)
            [1.0, 1.0, 0.5],  # data-level partial G+R
            [0.5, 0.5, 0.5],
            [0.25, 1.0, 0.75],
            [1.0, 0.0, 1.0],  # drain everything mid-pipeline
            [0.8, 0.8, 0.8],  # the LP's balanced subset plan
        ],
    )
    def test_any_p_matches_oracle(self, s2s, p):
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.array(p))
        assert_equivalent(run.result, s2s.oracle_sql, **s2s.oracle_tables)

    @pytest.mark.parametrize("seed", [0, 1, 42])
    def test_any_split_seed_matches_oracle(self, s2s, seed):
        run = run_partitioned(
            s2s.input_df, s2s.pipeline, np.array([0.6, 0.6, 0.6]), seed=seed
        )
        assert_equivalent(run.result, s2s.oracle_sql, **s2s.oracle_tables)


class TestOracleEquivalenceT2T:
    @pytest.mark.parametrize(
        "p",
        [
            [0.0] * 5,
            [1.0] * 5,
            [1.0, 1.0, 0.0, 0.0, 0.0],  # operator-level F-only
            [1.0, 1.0, 0.5, 1.0, 0.3],  # partial join + partial G+R
            [0.7, 0.4, 0.9, 0.2, 0.6],
        ],
    )
    def test_any_p_matches_oracle(self, t2t, p):
        run = run_partitioned(t2t.input_df, t2t.pipeline, np.array(p))
        assert_equivalent(run.result, t2t.oracle_sql, **t2t.oracle_tables)

    def test_bigger_static_table_same_result(self, spark, t2t):
        big = t2t_query(
            spark, n_sources=3, peers_per_source=25, n_windows=2, table_size=5000
        )
        run = run_partitioned(big.input_df, big.pipeline, np.array([1, 1, 0.5, 1, 0.5]))
        assert_equivalent(run.result, big.oracle_sql, **big.oracle_tables)


class TestOracleEquivalenceLog:
    @pytest.mark.parametrize(
        "p",
        [
            [0.0] * 4,
            [1.0] * 4,
            [1.0, 1.0, 1.0, 0.4],
            [1.0, 0.9, 0.2, 0.8],
            [0.3, 0.3, 0.3, 0.3],
        ],
    )
    def test_any_p_matches_oracle(self, logq, p):
        run = run_partitioned(logq.input_df, logq.pipeline, np.array(p))
        assert_equivalent(run.result, logq.oracle_sql, **logq.oracle_tables)


class TestAccounting:
    def test_counts_conserve_records(self, s2s):
        n = s2s.input_df.count()
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.array([0.5, 0.7, 0.3]))
        # Proxy 0 splits the whole input.
        assert run.taken_counts[0] + run.drained_counts[0] == n
        # Everything drained eventually reaches an SP-side operator.
        assert sum(run.sp_input_counts) >= max(run.drained_counts)

    def test_all_src_drains_nothing(self, s2s):
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.ones(3))
        assert run.drained_counts == (0, 0, 0)
        assert run.source_partial_rows > 0

    def test_all_sp_takes_nothing(self, s2s):
        n = s2s.input_df.count()
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.zeros(3))
        assert run.drained_counts[0] == n
        assert run.taken_counts == (0, 0, 0)
        assert run.source_partial_rows == 0

    def test_split_fractions_respected(self, s2s):
        n = s2s.input_df.count()
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.array([0.5, 1.0, 1.0]))
        assert run.taken_counts[0] / n == pytest.approx(0.5, abs=0.08)

    def test_seed_changes_split_not_result_size(self, s2s):
        p = np.array([0.5, 1.0, 1.0])
        a = run_partitioned(s2s.input_df, s2s.pipeline, p, seed=1)
        b = run_partitioned(s2s.input_df, s2s.pipeline, p, seed=2)
        assert a.taken_counts != b.taken_counts or a.drained_counts != b.drained_counts
        assert a.result.count() == b.result.count()

    def test_deterministic_same_seed(self, s2s):
        p = np.array([0.5, 0.5, 0.5])
        a = run_partitioned(s2s.input_df, s2s.pipeline, p, seed=9)
        b = run_partitioned(s2s.input_df, s2s.pipeline, p, seed=9)
        assert a.taken_counts == b.taken_counts
        assert a.drained_counts == b.drained_counts

    def test_collect_metrics_false_skips_counts(self, s2s):
        run = run_partitioned(
            s2s.input_df, s2s.pipeline, np.ones(3), collect_metrics=False
        )
        assert run.taken_counts == (-1, -1, -1)
        assert run.result.count() > 0

    def test_drained_bytes_overhead(self, s2s):
        run = run_partitioned(s2s.input_df, s2s.pipeline, np.array([1.0, 1.0, 0.0]))
        raw = run.drained_counts[2] * 86.0
        assert drained_bytes(run, s2s.pipeline, drain_overhead=1.5) == pytest.approx(
            raw * 1.5
        )
        # Stage-0 drains are bulk: overhead never applies.
        run0 = run_partitioned(s2s.input_df, s2s.pipeline, np.zeros(3))
        n = run0.drained_counts[0]
        assert drained_bytes(run0, s2s.pipeline, drain_overhead=1.5) == pytest.approx(
            n * 86.0
        )


class TestValidation:
    def test_wrong_p_length(self, s2s):
        with pytest.raises(ValueError, match="shape"):
            run_partitioned(s2s.input_df, s2s.pipeline, np.ones(2))

    def test_p_out_of_range(self, s2s):
        with pytest.raises(ValueError, match="0, 1"):
            run_partitioned(s2s.input_df, s2s.pipeline, np.array([1.5, 0, 0]))

    def test_missing_record_id(self, spark, s2s):
        bad = s2s.input_df.drop("record_id")
        with pytest.raises(ValueError, match="record_id"):
            run_partitioned(bad, s2s.pipeline, np.ones(3))


class TestDataLevelVsOperatorLevel:
    def test_partial_processing_reduces_drains(self, s2s):
        """Fig. 3's point: processing part of G+R's input shrinks the
        drain versus draining all of it (operator-level)."""
        op_level = run_partitioned(
            s2s.input_df, s2s.pipeline, np.array([1.0, 1.0, 0.0])
        )
        data_level = run_partitioned(
            s2s.input_df, s2s.pipeline, np.array([1.0, 1.0, 0.8])
        )
        assert data_level.drained_counts[2] < op_level.drained_counts[2]
        assert drained_bytes(data_level, s2s.pipeline) < drained_bytes(
            op_level, s2s.pipeline
        )
