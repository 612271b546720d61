"""Unit tests for control-proxy / query state classification."""
import numpy as np
import pytest

from repro.core.proxy import (
    EpochObservation,
    ProxyState,
    QueryState,
    classify_proxy,
    classify_query,
)


def obs(pending, idle, **kw):
    pending = np.asarray(pending, dtype=float)
    idle = np.asarray(idle, dtype=float)
    n = len(pending)
    z = np.zeros(n)
    return EpochObservation(
        arrived=z, forwarded=z, processed=z, drained=z,
        pending_frac=pending, idle_frac=idle, compute_used=0.0, **kw,
    )


@pytest.mark.parametrize(
    "pending,idle,expected",
    [
        (0.0, 0.0, ProxyState.STABLE),
        (0.05, 0.05, ProxyState.STABLE),  # both under thresholds
        (0.2, 0.0, ProxyState.CONGESTED),
        (0.0, 0.2, ProxyState.IDLE),
        (0.2, 0.9, ProxyState.CONGESTED),  # congestion dominates
        (0.10, 0.0, ProxyState.STABLE),  # exactly at threshold tolerated
        (0.0, 0.10, ProxyState.STABLE),
    ],
)
def test_classify_proxy(pending, idle, expected):
    assert classify_proxy(pending, idle) is expected


def test_query_congested_if_any_proxy_congested():
    o = obs([0.0, 0.5, 0.0], [0.0, 0.0, 0.0])
    assert classify_query(o, np.array([1.0, 1.0, 1.0])) is QueryState.CONGESTED


def test_query_idle_requires_all_idle():
    o = obs([0.0, 0.0], [0.5, 0.0])
    assert classify_query(o, np.array([0.5, 0.5])) is QueryState.STABLE
    o = obs([0.0, 0.0], [0.5, 0.5])
    assert classify_query(o, np.array([0.5, 0.5])) is QueryState.IDLE


def test_query_idle_suppressed_when_all_p_one():
    """All load factors at 1 means nothing can be raised: spare budget is
    not actionable, so the query must not oscillate into Profile/Adapt."""
    o = obs([0.0, 0.0], [0.9, 0.9])
    assert classify_query(o, np.array([1.0, 1.0])) is QueryState.STABLE


def test_query_idle_when_some_p_below_one():
    o = obs([0.0, 0.0], [0.9, 0.9])
    assert classify_query(o, np.array([1.0, 0.5])) is QueryState.IDLE


def test_custom_thresholds():
    o = obs([0.15], [0.0])
    assert classify_query(o, np.array([1.0]), drained_thres=0.2) is QueryState.STABLE
    assert classify_query(o, np.array([1.0]), drained_thres=0.1) is QueryState.CONGESTED
