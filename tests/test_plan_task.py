"""Tests for the task plan DAG (§4.1.2) and the task processor (§4.1).

Correctness reference: a brute-force recomputation over all events (and,
in test_sliding_oracle.py, the DuckDB oracle through the Spark path).
"""
import numpy as np
import pytest

from repro.core.language import parse_statement
from repro.core.task import TaskProcessor
from repro.core.windows import MINUTE, SECOND


def _payments(n=300, seed=0, n_cards=5, gap_ms=700):
    rng = np.random.default_rng(seed)
    ts = np.cumsum(rng.integers(1, gap_ms, n))
    return [
        {
            "id": i,
            "ts": int(ts[i]),
            "card_id": int(rng.integers(1, n_cards + 1)),
            "merchant_id": int(rng.integers(1, 3)),
            "amount": float(np.round(rng.uniform(1, 100), 2)),
        }
        for i in range(n)
    ]


def _brute(events, i, *, key, window_ms, field="amount", delay_ms=0, flt=None):
    """All field values of events[j<=i] in events[i]'s window for its key."""
    e = events[i]
    hi = e["ts"] - delay_ms
    lo = hi - window_ms
    return [
        x[field]
        for x in events[: i + 1]
        if x[key] == e[key] and lo < x["ts"] <= hi and (flt is None or flt(x))
    ]


def make_tp(tmp_path, sqls, **res_kw):
    res_kw.setdefault("chunk_events", 32)
    res_kw.setdefault("cache_chunks", 16)
    return TaskProcessor("t0", sqls, str(tmp_path / "tp"), reservoir_kwargs=res_kw)


def test_q1_sum_count_per_card(tmp_path):
    """Paper Example 1 Q1 over a real event trickle, checked per event."""
    tp = make_tp(
        tmp_path,
        ["SELECT sum(amount), count(amount) FROM payments "
         "GROUP BY card_id OVER sliding 1 minute"],
    )
    events = _payments()
    for i, e in enumerate(events):
        ans = tp.process(e)
        vals = _brute(events, i, key="card_id", window_ms=MINUTE)
        assert ans["sum(amount) by card_id over sliding 60000ms"] == pytest.approx(sum(vals))
        assert ans["count(amount) by card_id over sliding 60000ms"] == len(vals)


def test_multiple_windows_and_groupbys_shared_plan(tmp_path):
    """Q1+Q2 (two group-bys) + a second window size, all in one task."""
    tp = make_tp(
        tmp_path,
        [
            "SELECT sum(amount) FROM payments GROUP BY card_id OVER sliding 1 minute",
            "SELECT avg(amount) FROM payments GROUP BY merchant_id OVER sliding 1 minute",
            "SELECT count(amount) FROM payments GROUP BY card_id OVER sliding 10 seconds",
        ],
    )
    # same-delay windows share the head iterator: 1 head + 2 tails
    assert tp.plan.iterator_count == 3
    events = _payments(n=250)
    for i, e in enumerate(events):
        ans = tp.process(e)
        v1 = _brute(events, i, key="card_id", window_ms=MINUTE)
        v2 = _brute(events, i, key="merchant_id", window_ms=MINUTE)
        v3 = _brute(events, i, key="card_id", window_ms=10 * SECOND)
        assert ans["sum(amount) by card_id over sliding 60000ms"] == pytest.approx(sum(v1))
        assert ans["avg(amount) by merchant_id over sliding 60000ms"] == pytest.approx(
            np.mean(v2)
        )
        assert ans["count(amount) by card_id over sliding 10000ms"] == len(v3)


def test_filter_operator(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments WHERE amount > 50 "
         "GROUP BY card_id OVER sliding 1 minute"],
    )
    events = _payments(n=200)
    name = tp.plan.leaves[0].metric.name
    for i, e in enumerate(events):
        ans = tp.process(e)
        vals = _brute(
            events, i, key="card_id", window_ms=MINUTE, flt=lambda x: x["amount"] > 50
        )
        assert ans[name] == len(vals)


def test_delayed_window(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments GROUP BY card_id "
         "OVER sliding 30 seconds delayed by 10 seconds"],
    )
    events = _payments(n=200)
    name = tp.plan.leaves[0].metric.name
    for i, e in enumerate(events):
        ans = tp.process(e)
        vals = _brute(
            events, i, key="card_id", window_ms=30 * SECOND, delay_ms=10 * SECOND
        )
        assert ans[name] == len(vals)


def test_infinite_window(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT countDistinct(merchant_id), count(amount) FROM payments "
         "GROUP BY card_id OVER infinite"],
    )
    events = _payments(n=200)
    for i, e in enumerate(events):
        ans = tp.process(e)
        seen = [x for x in events[: i + 1] if x["card_id"] == e["card_id"]]
        assert ans["count(amount) by card_id over infinite"] == len(seen)
        assert ans["countDistinct(merchant_id) by card_id over infinite"] == len(
            {x["merchant_id"] for x in seen}
        )


def test_tumbling_window(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT sum(amount) FROM payments GROUP BY card_id OVER tumbling 20 seconds"],
    )
    events = _payments(n=200)
    name = tp.plan.leaves[0].metric.name
    w = 20 * SECOND
    for i, e in enumerate(events):
        ans = tp.process(e)
        bucket = (e["ts"] // w) * w
        vals = [
            x["amount"]
            for x in events[: i + 1]
            if x["card_id"] == e["card_id"] and bucket <= x["ts"] <= e["ts"]
        ]
        assert ans[name] == pytest.approx(sum(vals))


def test_min_max_stddev_over_window(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT min(amount), max(amount), stdDev(amount) FROM payments "
         "GROUP BY card_id OVER sliding 30 seconds"],
    )
    events = _payments(n=250, n_cards=3)
    for i, e in enumerate(events):
        ans = tp.process(e)
        vals = _brute(events, i, key="card_id", window_ms=30 * SECOND)
        assert ans["min(amount) by card_id over sliding 30000ms"] == pytest.approx(min(vals))
        assert ans["max(amount) by card_id over sliding 30000ms"] == pytest.approx(max(vals))
        expect_sd = np.std(vals, ddof=1) if len(vals) >= 2 else None
        got_sd = ans["stdDev(amount) by card_id over sliding 30000ms"]
        if expect_sd is None:
            assert got_sd is None
        else:
            assert got_sd == pytest.approx(expect_sd, rel=1e-6)


def test_duplicate_event_does_not_change_aggregates(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments GROUP BY card_id OVER sliding 1 minute"],
    )
    name = tp.plan.leaves[0].metric.name
    e = {"id": 1, "ts": 1000, "card_id": 1, "merchant_id": 1, "amount": 5.0}
    assert tp.process(e)[name] == 1
    assert tp.process(dict(e))[name] == 1  # dedup: unchanged, still answered


def test_late_event_rewrite_included_in_aggregate(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments GROUP BY card_id OVER sliding 1 minute"],
        chunk_events=4,
        out_of_order="rewrite",
    )
    name = tp.plan.leaves[0].metric.name
    for i in range(6):  # seals the first 4-event chunk
        tp.process({"id": i, "ts": 1000 * (i + 1), "card_id": 1,
                    "merchant_id": 1, "amount": 1.0})
    # late event: ts before the sealed chunk's end; rewritten into open chunk
    ans = tp.process({"id": "late", "ts": 1500, "card_id": 1,
                      "merchant_id": 1, "amount": 1.0})
    assert ans[name] == 7  # all 6 + the rewritten late event


def test_out_of_order_within_open_chunk_counted(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments GROUP BY card_id OVER sliding 1 minute"],
        chunk_events=64,
    )
    name = tp.plan.leaves[0].metric.name
    tp.process({"id": 0, "ts": 1000, "card_id": 1, "merchant_id": 1, "amount": 1.0})
    tp.process({"id": 1, "ts": 5000, "card_id": 1, "merchant_id": 1, "amount": 1.0})
    # out-of-order but within the open chunk: inserted behind the head cursor
    ans = tp.process({"id": 2, "ts": 3000, "card_id": 1,
                      "merchant_id": 1, "amount": 1.0})
    assert ans[name] == 3
    # and subsequent events still see it until it expires
    ans = tp.process({"id": 3, "ts": 6000, "card_id": 1,
                      "merchant_id": 1, "amount": 1.0})
    assert ans[name] == 4


def test_prefill_and_warm_up_give_live_tail(tmp_path):
    """§5.2(a) methodology: checkpoint-load history, then measure steady state."""
    tp = make_tp(
        tmp_path,
        ["SELECT count(amount) FROM payments GROUP BY card_id OVER sliding 1 minute"],
        chunk_events=16,
    )
    name = tp.plan.leaves[0].metric.name
    hist = [
        {"id": f"h{i}", "ts": i * 1000, "card_id": 1, "merchant_id": 1, "amount": 1.0}
        for i in range(100)
    ]
    tp.prefill(hist)
    tp.warm_up(hist[-1]["ts"])
    # window (40000, 100000] over card 1: history ts 41000..99000 = 59
    # events, plus the arriving one = 60
    ans = tp.process({"id": "x", "ts": 100_000, "card_id": 1,
                      "merchant_id": 1, "amount": 1.0})
    assert ans[name] == 60


def test_checkpoint_recover_resumes_exactly(tmp_path):
    sqls = ["SELECT sum(amount), count(amount) FROM payments "
            "GROUP BY card_id OVER sliding 1 minute"]
    tp = make_tp(tmp_path, sqls, chunk_events=16)
    events = _payments(n=200)
    for e in events[:120]:
        tp.process(e)
    ckpt = tp.checkpoint()
    tp2 = TaskProcessor.recover(
        ckpt, sqls, str(tmp_path / "tp2"),
        reservoir_kwargs={"chunk_events": 16, "cache_chunks": 16},
    )
    # both processors answer identically on the remaining stream
    for i, e in enumerate(events[120:]):
        a1 = tp.process(e)
        a2 = tp2.process(e)
        assert a1 == a2, f"divergence at event {i}"


def test_stats_reporting(tmp_path):
    tp = make_tp(
        tmp_path,
        ["SELECT sum(amount) FROM payments GROUP BY card_id OVER sliding 1 minute"],
    )
    for e in _payments(n=100):
        tp.process(e)
    st = tp.stats()
    assert st["events"] == 100
    assert st["iterators"] == 2
    assert st["state_keys"] > 0
    assert st["sealed_chunks"] >= 2
