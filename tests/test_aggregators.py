"""Unit tests for the incremental aggregators (paper §3.4 / §4.1.3)."""
import math
import random

import numpy as np
import pytest

from repro.core.aggregators import AGGREGATORS, make_aggregator


def _reference(agg: str, values: list[float]) -> float | None:
    if agg == "count":
        return float(len(values))
    if agg == "countDistinct":
        return float(len(set(values)))
    if not values:
        return None
    if agg == "sum":
        return float(sum(values))
    if agg == "avg":
        return float(np.mean(values))
    if agg == "min":
        return float(min(values))
    if agg == "max":
        return float(max(values))
    if agg == "stdDev":
        return float(np.std(values, ddof=1)) if len(values) >= 2 else None
    if agg == "last":
        return values[-1]
    if agg == "prev":
        return values[-2] if len(values) >= 2 else None
    if agg == "countDistinct":
        return float(len(set(values)))
    raise AssertionError(agg)


def _run_window(agg: str, values: list[float], window: int) -> None:
    """Slide a count-based window over `values`; check every evaluation."""
    a = make_aggregator(agg)
    for i, v in enumerate(values):
        a.add(i, v)
        if i >= window:
            a.evict(i - window, values[i - window])
        expect = _reference(agg, values[max(0, i - window + 1): i + 1])
        got = a.value()
        if expect is None:
            assert got is None, f"{agg}@{i}: {got} != None"
        else:
            assert got == pytest.approx(float(expect), rel=1e-9, abs=1e-9), f"{agg}@{i}"


@pytest.mark.parametrize("agg", sorted(AGGREGATORS))
@pytest.mark.parametrize("window", [1, 2, 5, 17])
def test_sliding_correctness_random(agg, window):
    rng = random.Random(window * 1000 + len(agg))
    values = [round(rng.uniform(-50, 50), 2) for _ in range(200)]
    _run_window(agg, values, window)


@pytest.mark.parametrize("agg", sorted(AGGREGATORS))
def test_sliding_correctness_duplicates(agg):
    """Repeated values exercise min/max deque ties and distinct counts."""
    rng = random.Random(42)
    values = [float(rng.choice([1, 1, 2, 3, 3, 3, 7])) for _ in range(300)]
    _run_window(agg, values, 9)


@pytest.mark.parametrize("agg", sorted(AGGREGATORS))
def test_empty_window_values(agg):
    a = make_aggregator(agg)
    if agg in ("count", "countDistinct"):
        assert a.value() == 0
    else:
        assert a.value() is None


@pytest.mark.parametrize("agg", sorted(AGGREGATORS))
def test_add_then_full_evict_returns_to_empty(agg):
    a = make_aggregator(agg)
    vals = [3.0, -1.0, 3.0, 8.5]
    for i, v in enumerate(vals):
        a.add(i, v)
    for i, v in enumerate(vals):
        a.evict(i, v)
    if agg in ("count", "countDistinct"):
        assert a.value() == 0
    else:
        assert a.value() is None


def test_stddev_welford_matches_numpy_long_run():
    a = make_aggregator("stdDev")
    rng = random.Random(7)
    values = [rng.gauss(1000.0, 5.0) for _ in range(2000)]
    w = 64
    for i, v in enumerate(values):
        a.add(i, v)
        if i >= w:
            a.evict(i - w, values[i - w])
    expect = np.std(values[-w:], ddof=1)
    assert a.value() == pytest.approx(expect, rel=1e-6)


def test_stddev_single_element_none_after_evictions():
    a = make_aggregator("stdDev")
    a.add(0, 5.0)
    a.add(1, 9.0)
    a.evict(0, 5.0)
    assert a.value() is None  # n = 1


def test_min_max_monotonic_deque_eviction_order():
    mx = make_aggregator("max")
    mx.add(0, 10.0)
    mx.add(1, 3.0)
    mx.add(2, 7.0)
    assert mx.value() == 10.0
    mx.evict(0, 10.0)
    assert mx.value() == 7.0  # 3.0 was dominated and dropped
    mx.evict(1, 3.0)  # not the deque front; no-op
    assert mx.value() == 7.0


def test_count_distinct_multiplicity():
    cd = make_aggregator("countDistinct")
    cd.add(0, "a")
    cd.add(1, "a")
    cd.add(2, "b")
    assert cd.value() == 2
    cd.evict(0, "a")
    assert cd.value() == 2  # one "a" still present
    cd.evict(1, "a")
    assert cd.value() == 1


def test_last_prev_semantics():
    last, prev = make_aggregator("last"), make_aggregator("prev")
    for i, v in enumerate([1.0, 2.0, 3.0]):
        last.add(i, v)
        prev.add(i, v)
    assert last.value() == 3.0
    assert prev.value() == 2.0
    last.evict(0, 1.0)
    prev.evict(0, 1.0)
    assert last.value() == 3.0
    assert prev.value() == 2.0


def test_unknown_aggregation_rejected():
    with pytest.raises(ValueError, match="unknown aggregation"):
        make_aggregator("median")


def test_aggregators_are_picklable():
    """The state store serializes aggregator objects on every write."""
    import pickle

    for name in AGGREGATORS:
        a = make_aggregator(name)
        a.add(0, 1.0)
        b = pickle.loads(pickle.dumps(a))
        assert b.value() == a.value()
