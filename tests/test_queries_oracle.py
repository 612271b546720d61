"""Unpartitioned query semantics vs the DuckDB oracle.

`apply_full` is the reference the partitioned executions are compared
to; this file pins *it* against an independent engine.
"""
import pytest

from repro.oracle import assert_equivalent
from repro.workloads.queries import log_query, s2s_query, t2t_query


@pytest.mark.parametrize("seed", [7, 21])
def test_s2s_full_matches_duckdb(spark, seed):
    b = s2s_query(spark, n_sources=3, peers_per_source=20, n_windows=2, seed=seed)
    assert_equivalent(b.pipeline.apply_full(b.input_df), b.oracle_sql, **b.oracle_tables)


@pytest.mark.parametrize("table_size", [500, 1500])
def test_t2t_full_matches_duckdb(spark, table_size):
    b = t2t_query(
        spark, n_sources=3, peers_per_source=20, n_windows=2, table_size=table_size
    )
    assert_equivalent(b.pipeline.apply_full(b.input_df), b.oracle_sql, **b.oracle_tables)


@pytest.mark.parametrize("seed", [11, 99])
def test_log_full_matches_duckdb(spark, seed):
    b = log_query(spark, n_sources=3, lines_per_source_window=50, n_windows=2, seed=seed)
    assert_equivalent(b.pipeline.apply_full(b.input_df), b.oracle_sql, **b.oracle_tables)


def test_s2s_output_is_aggregated(spark):
    """Aggregation reduces the stream to per-pair-per-window rows."""
    b = s2s_query(spark, n_sources=2, peers_per_source=15, n_windows=2)
    out = b.pipeline.apply_full(b.input_df)
    n_in = b.input_df.count()
    n_out = out.count()
    assert n_out < n_in
    # At most one row per (window, pair).
    assert n_out <= 2 * 2 * 15


def test_t2t_projection_reduces_width(spark):
    """The paper notes the projection after J shrinks records — the data
    reduction that makes partial join processing worthwhile."""
    b = t2t_query(spark, n_sources=2, peers_per_source=15, n_windows=2)
    j_out = b.pipeline.ops[2].apply(
        b.pipeline.ops[1].apply(b.pipeline.ops[0].apply(b.input_df))
    )
    p_out = b.pipeline.ops[3].apply(j_out)
    assert len(p_out.columns) < len(j_out.columns)
