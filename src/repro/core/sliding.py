"""Spark reference implementations of per-event window answers.

Two DataFrame → DataFrame transformations, both exact and
oracle-checkable:

- :func:`sliding_answers` — what a **real-time sliding window** must
  answer for every event: the aggregate over ``(t - w, t]`` of the
  event's entity, evaluated at the event's own timestamp. Implemented as
  an ``applyInPandas`` per-entity two-pointer pass (amortized O(1) per
  event), reusing the same incremental aggregators as the Railgun engine.
  Checked against DuckDB ``RANGE BETWEEN (w-1) PRECEDING AND CURRENT ROW``
  window frames in the tests.

- :func:`hopping_answers` — what a **hopping-window** system (Flink-style)
  can answer per event: the aggregate of the *last completed* hop window
  ``[b - w, b)``, ``b = floor(t/hop)·hop``. This reproduces Fig 1: the
  5th event within 5 minutes of the 1st sees a count of 4.

- :func:`hopping_accuracy` — quantifies the paper's **A** requirement:
  per-event agreement between hopping and true sliding answers, plus the
  §2.1 business-rule miss rate ("block if count(last 5 min) > 4").
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import DoubleType, StructField, StructType

from .aggregators import make_aggregator

# Aggregations whose per-event answers these references support.
NUMERIC_AGGS = ("count", "sum", "avg", "min", "max", "stdDev", "countDistinct")


def _out_schema(df: DataFrame, key: str, aggs: tuple[str, ...], field: str) -> StructType:
    base = [
        StructField("id", df.schema["id"].dataType),
        StructField("ts", df.schema["ts"].dataType),
        StructField(key, df.schema[key].dataType),
    ]
    return StructType(base + [StructField(f"{a}_{field}", DoubleType()) for a in aggs])


def _sliding_group(
    pdf: pd.DataFrame, key: str, field: str, aggs: tuple[str, ...],
    window_ms: int, delay_ms: int
) -> pd.DataFrame:
    pdf = pdf.sort_values(["ts", "id"], kind="mergesort").reset_index(drop=True)
    ts = pdf["ts"].to_numpy()
    vals = pdf[field].to_numpy()
    n = len(pdf)
    objs = [make_aggregator(a) for a in aggs]
    out = np.full((len(aggs), n), np.nan)
    head = tail = 0
    for i in range(n):
        hi = ts[i] - delay_ms
        lo = hi - window_ms
        while head < n and ts[head] <= hi:
            for o in objs:
                o.add(head, vals[head])
            head += 1
        while tail < head and ts[tail] <= lo:
            for o in objs:
                o.evict(tail, vals[tail])
            tail += 1
        for j, o in enumerate(objs):
            v = o.value()
            if v is not None:
                out[j, i] = float(v)
    res = pdf[["id", "ts", key]].copy()
    for j, a in enumerate(aggs):
        res[f"{a}_{field}"] = out[j]
    return res


def sliding_answers(
    df: DataFrame,
    *,
    key: str = "card_id",
    field: str = "amount",
    aggs: tuple[str, ...] = ("sum",),
    window_ms: int,
    delay_ms: int = 0,
) -> DataFrame:
    """Exact per-event sliding-window aggregates, one row per input event."""
    for a in aggs:
        if a not in NUMERIC_AGGS:
            raise ValueError(f"unsupported per-event agg {a!r}")
    schema = _out_schema(df, key, aggs, field)

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        return _sliding_group(pdf, key, field, aggs, window_ms, delay_ms)

    return df.select("id", "ts", key, field).groupBy(key).applyInPandas(fn, schema)


def _hopping_group(
    pdf: pd.DataFrame, key: str, field: str, aggs: tuple[str, ...],
    window_ms: int, hop_ms: int
) -> pd.DataFrame:
    pdf = pdf.sort_values(["ts", "id"], kind="mergesort").reset_index(drop=True)
    ts = pdf["ts"].to_numpy()
    vals = pdf[field].to_numpy()
    n = len(pdf)
    objs = [make_aggregator(a) for a in aggs]
    out = np.full((len(aggs), n), np.nan)
    head = tail = 0
    for i in range(n):
        b = (ts[i] // hop_ms) * hop_ms  # end of the last completed window
        while head < n and ts[head] < b:
            for o in objs:
                o.add(head, vals[head])
            head += 1
        while tail < head and ts[tail] < b - window_ms:
            for o in objs:
                o.evict(tail, vals[tail])
            tail += 1
        for j, o in enumerate(objs):
            v = o.value()
            if v is not None:
                out[j, i] = float(v)
    res = pdf[["id", "ts", key]].copy()
    for j, a in enumerate(aggs):
        res[f"{a}_{field}"] = out[j]
    return res


def hopping_answers(
    df: DataFrame,
    *,
    key: str = "card_id",
    field: str = "amount",
    aggs: tuple[str, ...] = ("sum",),
    window_ms: int,
    hop_ms: int,
) -> DataFrame:
    """Per-event answers a hopping-window system serves (last completed window)."""
    schema = _out_schema(df, key, aggs, field)

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        return _hopping_group(pdf, key, field, aggs, window_ms, hop_ms)

    return df.select("id", "ts", key, field).groupBy(key).applyInPandas(fn, schema)


def hopping_accuracy(
    df: DataFrame,
    *,
    key: str = "card_id",
    field: str = "amount",
    window_ms: int,
    hop_ms: int,
    rule_threshold: int = 4,
) -> dict[str, float]:
    """The **A**-requirement scorecard for one hop size.

    Returns per-event agreement of sum/count with the true sliding answer,
    and the §2.1 rule analysis: of the events where the true sliding count
    exceeds ``rule_threshold`` ("block the transaction"), what fraction
    does the hopping approximation miss?
    """
    true_df = sliding_answers(
        df, key=key, field=field, aggs=("sum", "count"), window_ms=window_ms
    ).select(
        "id",
        F.col(f"sum_{field}").alias("true_sum"),
        F.col(f"count_{field}").alias("true_count"),
    )
    hop_df = hopping_answers(
        df, key=key, field=field, aggs=("sum", "count"),
        window_ms=window_ms, hop_ms=hop_ms,
    ).select(
        "id",
        F.col(f"sum_{field}").alias("hop_sum"),
        F.col(f"count_{field}").alias("hop_count"),
    )
    j = true_df.join(hop_df, "id")
    row = j.select(
        F.count("*").alias("n"),
        F.sum(
            (F.abs(F.coalesce(F.col("hop_sum"), F.lit(0.0)) - F.col("true_sum")) < 1e-6)
            .cast("long")
        ).alias("sum_ok"),
        F.sum(
            (F.coalesce(F.col("hop_count"), F.lit(0.0)) == F.col("true_count"))
            .cast("long")
        ).alias("count_ok"),
        F.sum((F.col("true_count") > rule_threshold).cast("long")).alias("rule_true"),
        F.sum(
            (
                (F.col("true_count") > rule_threshold)
                & (F.coalesce(F.col("hop_count"), F.lit(0.0)) <= rule_threshold)
            ).cast("long")
        ).alias("rule_missed"),
    ).collect()[0]
    return {
        "events": row["n"],
        "sum_agreement": row["sum_ok"] / row["n"],
        "count_agreement": row["count_ok"] / row["n"],
        "rule_triggers": row["rule_true"],
        "rule_miss_rate": (row["rule_missed"] / row["rule_true"]) if row["rule_true"] else 0.0,
    }
