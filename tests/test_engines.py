"""The §5.1 engines answer exactly what their references say.

- RailgunEngine ≡ per-event real-time sliding answers (and therefore, by
  test_sliding_oracle.py, ≡ the DuckDB oracle);
- FlinkHoppingEngine ≡ the last-completed-hopping-window reference;
- FlinkRecomputeEngine ≡ the sliding reference (it is accurate — just
  algorithmically quadratic, which is the point of §2.2's critique).
"""
import math

import pytest

from repro import synth_data
from repro.core.engines import FlinkHoppingEngine, FlinkRecomputeEngine, RailgunEngine
import pandas as pd

from repro.core.sliding import _hopping_group, _sliding_group
from repro.core.windows import MINUTE, SECOND


def _per_card(group_fn, pdf, *args):
    """Apply a per-entity reference function per card (as Spark's groupBy does)."""
    return pd.concat(
        [group_fn(g, "card_id", "amount", *args) for _, g in pdf.groupby("card_id")],
        ignore_index=True,
    )


@pytest.fixture(scope="module")
def stream():
    pdf = synth_data.payments_pdf(n=1500, rate_hz=2.0, n_cards=25, seed=3)
    return pdf, pdf.to_dict("records")


def _close(a, b):
    if a is None and (b is None or (isinstance(b, float) and math.isnan(b))):
        return True
    if a is None or b is None or (isinstance(b, float) and math.isnan(b)):
        return False
    return abs(float(a) - float(b)) < 1e-6


def _check_engine(engine, events, ref_pdf, aggs, field="amount"):
    ref = ref_pdf.set_index("id")
    for e in events:
        ans = engine.process(e)
        for a in aggs:
            col = f"{a}_{field}"
            expect = ref.loc[e["id"], col]
            assert _close(ans[col], expect), (
                f"event {e['id']} {col}: engine={ans[col]} ref={expect}"
            )


def test_railgun_engine_matches_sliding_reference(tmp_path, stream):
    pdf, events = stream
    aggs = ("sum", "count", "avg")
    eng = RailgunEngine(
        str(tmp_path / "rg"), aggs=aggs, window_ms=MINUTE,
        reservoir_kwargs={"chunk_events": 64, "cache_chunks": 32},
    )
    ref = _per_card(_sliding_group, pdf, aggs, MINUTE, 0)
    _check_engine(eng, events, ref, aggs)


def test_railgun_engine_long_window_equals_short_on_shared_head(tmp_path, stream):
    """Window size changes what expires, never what arrives (§4.1.1)."""
    pdf, events = stream
    eng = RailgunEngine(
        str(tmp_path / "rg2"), aggs=("count",), window_ms=24 * 60 * MINUTE,
        reservoir_kwargs={"chunk_events": 64, "cache_chunks": 32},
    )
    # a day-long window over a ~12-min stream == infinite window here
    for i, e in enumerate(events):
        ans = eng.process(e)
        expect = sum(1 for x in events[: i + 1] if x["card_id"] == e["card_id"])
        assert ans["count_amount"] == expect


@pytest.mark.parametrize("hop_ms", [MINUTE, 15 * SECOND])
def test_flink_hopping_engine_matches_reference(stream, hop_ms):
    pdf, events = stream
    aggs = ("sum", "count")
    eng = FlinkHoppingEngine(aggs=aggs, window_ms=5 * MINUTE, hop_ms=hop_ms)
    ref = _per_card(_hopping_group, pdf, aggs, 5 * MINUTE, hop_ms)
    _check_engine(eng, events, ref, aggs)


def test_flink_hopping_pane_count(stream):
    eng = FlinkHoppingEngine(aggs=("sum",), window_ms=60 * MINUTE, hop_ms=MINUTE)
    assert eng.panes_per_event == 60
    with pytest.raises(ValueError):
        FlinkHoppingEngine(aggs=("sum",), window_ms=MINUTE, hop_ms=7000)


def test_flink_hopping_pane_state_expires(stream):
    """Fired windows purge their panes — state is bounded by active panes."""
    pdf, events = stream
    eng = FlinkHoppingEngine(aggs=("sum",), window_ms=MINUTE, hop_ms=15 * SECOND)
    for e in events:
        eng.process(e)
    active_panes = len(list(eng.store.keys("panes")))
    # ≤ (#cards active in the last window+hop) × panes_per_event, far fewer
    # than #events — hopping's memory advantage (§2.2)
    assert active_panes <= 25 * eng.panes_per_event


def test_flink_recompute_engine_matches_sliding_reference(stream):
    pdf, events = stream
    aggs = ("sum", "count", "min", "max")
    eng = FlinkRecomputeEngine(aggs=aggs, window_ms=MINUTE)
    ref = _per_card(_sliding_group, pdf, aggs, MINUTE, 0)
    _check_engine(eng, events, ref, aggs)


def test_hopping_engine_synthetic_costs_scale_with_pane_count():
    """§2.2's cost argument, as the harness sees it: per-event synthetic
    cost is proportional to windowSize/hop."""
    ev = {"id": 0, "ts": 3_600_000, "card_id": 1, "amount": 1.0}
    costs = {}
    for hop in (60, 10, 1):
        eng = FlinkHoppingEngine(
            aggs=("sum",), window_ms=60 * MINUTE, hop_ms=hop * SECOND,
            framework_overhead_us_per_pane=8.0,
        )
        eng.process(dict(ev))
        costs[hop], _ = eng.take_costs()
    assert costs[10] > 5 * costs[60]
    assert costs[1] > 5 * costs[10]


def test_railgun_engine_cost_independent_of_window_size(tmp_path, stream):
    """The M-enabler: Railgun per-event work does not grow with the window."""
    pdf, events = stream
    totals = {}
    for label, w in (("5min", 5 * MINUTE), ("1day", 24 * 60 * MINUTE)):
        eng = RailgunEngine(
            str(tmp_path / f"rgc{label}"), aggs=("sum",), window_ms=w,
            reservoir_kwargs={"chunk_events": 64, "cache_chunks": 32},
        )
        store_ops = 0
        for e in events:
            eng.process(e)
        totals[label] = eng.tp.store.gets + eng.tp.store.puts
    assert totals["1day"] <= totals["5min"] * 1.1
