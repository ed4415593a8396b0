"""Task processor (paper §4.1): reservoir + state store + task plan.

A task processor computes *all* metrics of one (topic, partition), shares
nothing with other task processors, and runs single-threaded. Processing
one message = append to the event reservoir → advance the plan DAG
(arrivals + expirations) → answer with the arriving event's aggregates.

Checkpointing (§4.1.3) synchronizes the reservoir and the state store:
``checkpoint()`` seals in-memory chunks, flushes state, and records the
last processed sequence/offset so a recovering processor can copy the
files and replay the delta from the messaging layer.
"""
from __future__ import annotations

import os
import shutil
from typing import Any, Iterable

from .language import Statement, parse_statement
from .plan import TaskPlan
from .reservoir import Event, EventReservoir
from .statestore import StateStore


class TaskProcessor:
    """One (topic, partition)'s computation: metrics over its event subset."""

    def __init__(
        self,
        task_id: str,
        statements: Iterable[Statement | str],
        data_dir: str,
        *,
        reservoir_kwargs: dict | None = None,
        store_kwargs: dict | None = None,
    ):
        self.task_id = task_id
        self.statements = [
            parse_statement(s) if isinstance(s, str) else s for s in statements
        ]
        self.dir = data_dir
        os.makedirs(data_dir, exist_ok=True)
        self.reservoir = EventReservoir(
            os.path.join(data_dir, "reservoir"), **(reservoir_kwargs or {})
        )
        self.store = StateStore(
            os.path.join(data_dir, "state"), **(store_kwargs or {})
        )
        self.plan = TaskPlan(self.statements, self.reservoir, self.store)
        self._seq = 0
        self.last_offset: int | None = None  # messaging-layer offset, if any

    # -- event path ----------------------------------------------------------

    def process(self, event: Event, offset: int | None = None) -> dict[str, Any]:
        """Process one message, return all metric answers for its entities.

        Duplicates (by event id) and late-dropped events do not change
        state; Railgun still answers with the current aggregates — it
        never delays or withholds the reply (§4.1.1).
        """
        e = dict(event)
        e["seq"] = self._seq
        status, cid, pos = self.reservoir.append(e)
        if offset is not None:
            self.last_offset = offset
        if status in ("dup", "late-dropped"):
            return self.plan.answers(e)
        self._seq += 1
        self.plan.advance(e["ts"], late_event=e, late_pos=(cid, pos))
        return self.plan.answers(e)

    def prefill(self, events: Iterable[Event]) -> int:
        """Bulk-append history without advancing the plan (checkpoint load).

        Used by §5.2(a): large windows are exercised by loading history so
        head *and* tail iterators are live from the first processed event.
        Follow with :meth:`warm_up`.
        """
        n = 0
        for event in events:
            e = dict(event)
            e["seq"] = self._seq
            status, _, _ = self.reservoir.append(e)
            if status not in ("dup", "late-dropped"):
                self._seq += 1
                n += 1
        return n

    def warm_up(self, now_ts: int) -> None:
        """Advance the plan over prefilled history in one batched pass."""
        self.plan.advance(now_ts)
        self.take_costs()  # warm-up cost is not part of steady-state latency

    def warm_start(self, history, now_ts: int) -> None:
        """Vectorized checkpoint load (§5.2 methodology).

        ``history`` is the pandas DataFrame of the events already
        ``prefill``-ed into the reservoir. Builds each leaf's per-entity
        aggregate state directly with pandas groupbys (instead of
        replaying events one by one), then seeks every window iterator to
        its steady-state position. Supports the decomposable aggregations
        (sum/count/avg/stdDev); metrics needing event order (min/max/
        last/prev) must warm up via :meth:`warm_up`.
        """
        import pandas as pd  # local: keep core import-light

        from .aggregators import Avg, Count, StdDev, Sum

        self.reservoir.flush()
        for leaf in self.plan.leaves:
            lo, hi = leaf.metric.window.bounds(now_ts)
            if leaf.metric.filter_sql is not None:
                raise ValueError("warm_start does not support filtered metrics")
            sub = history[(history["ts"] > lo) & (history["ts"] <= hi)]
            if sub.empty:
                continue
            gb = list(leaf.metric.group_by)
            field = leaf.metric.agg_field
            agg = leaf.metric.agg
            if agg in ("sum", "count", "avg"):
                g = sub.groupby(gb[0] if len(gb) == 1 else gb)[field].agg(
                    ["sum", "count"]
                )
                for key, row in g.iterrows():
                    if agg == "count":
                        obj = Count()
                        obj.n = int(row["count"])
                    else:
                        obj = Sum() if agg == "sum" else Avg()
                        obj.s = float(row["sum"])
                        obj.n = int(row["count"])
                    self.store.put(key, obj, leaf.cf)
            elif agg == "stdDev":
                g = sub.groupby(gb[0] if len(gb) == 1 else gb)[field].agg(
                    ["count", "mean", "var"]
                )
                for key, row in g.iterrows():
                    obj = StdDev()
                    obj.n = int(row["count"])
                    obj.mean = float(row["mean"])
                    obj.m2 = float(row["var"]) * (obj.n - 1) if obj.n > 1 else 0.0
                    self.store.put(key, obj, leaf.cf)
            else:
                raise ValueError(f"warm_start does not support {agg!r}")
        for wnode in self.plan.windows.values():
            lo, hi = wnode.spec.bounds(now_ts)
            wnode.head.seek_after(hi)
            if wnode.tail is not None:
                wnode.tail.seek_after(lo)
        self.take_costs()

    # -- accounting ------------------------------------------------------------

    def take_costs(self) -> tuple[float, float]:
        """(synthetic_us, discount_s) accrued since last call (see bench)."""
        r_syn, r_disc = self.reservoir.take_costs()
        return r_syn + self.store.take_costs(), r_disc

    def stats(self) -> dict[str, Any]:
        r = self.reservoir
        return {
            "events": r.total_events,
            "sealed_chunks": r.sealed_chunks(),
            "disk_bytes": r.disk_bytes(),
            "memory_events": r.memory_events(),
            "iterators": self.plan.iterator_count,
            "cache_hits": r.cache.hits,
            "cache_misses": r.cache.misses,
            "demand_loads": r.demand_loads,
            "prefetch_loads": r.prefetch_loads,
            "state_keys": len(self.store),
        }

    # -- checkpoint / recovery ---------------------------------------------------

    def checkpoint(self) -> dict:
        """Synchronized reservoir+state checkpoint (paper §4.1.3)."""
        meta = self.reservoir.checkpoint()
        state_path = self.store.checkpoint("latest")
        return {
            "task_id": self.task_id,
            "reservoir": meta,
            "state_path": state_path,
            "seq": self._seq,
            "last_offset": self.last_offset,
        }

    @classmethod
    def recover(
        cls,
        ckpt: dict,
        statements: Iterable[Statement | str],
        data_dir: str,
        *,
        reservoir_kwargs: dict | None = None,
        store_kwargs: dict | None = None,
    ) -> "TaskProcessor":
        """Rebuild a processor from another processor's checkpoint.

        Copies the reservoir files and state snapshot (the paper's data
        transfer between processor units), then the caller replays
        messages after ``ckpt['last_offset']`` from the messaging layer.
        """
        tp = cls.__new__(cls)
        tp.task_id = ckpt["task_id"]
        tp.statements = [
            parse_statement(s) if isinstance(s, str) else s for s in statements
        ]
        tp.dir = data_dir
        res_dir = os.path.join(data_dir, "reservoir")
        state_dir = os.path.join(data_dir, "state")
        os.makedirs(res_dir, exist_ok=True)
        os.makedirs(state_dir, exist_ok=True)
        for src in ckpt["reservoir"]["files"]:
            shutil.copy(src, os.path.join(res_dir, os.path.basename(src)))
        tp.reservoir = EventReservoir.restore(
            res_dir, ckpt["reservoir"], **(reservoir_kwargs or {})
        )
        state_copy = os.path.join(state_dir, "latest.state")
        shutil.copy(ckpt["state_path"], state_copy)
        tp.store = StateStore.restore(
            state_copy, state_dir, **(store_kwargs or {})
        )
        tp.plan = TaskPlan(tp.statements, tp.reservoir, tp.store)
        tp._seq = ckpt["seq"]
        tp.last_offset = ckpt["last_offset"]
        # Iterators restart at the reservoir start; fast-forward aggregates
        # are already in the copied state store, so reposition heads/tails
        # to the end without reapplying: rebuild state from scratch instead
        # is wasteful — but cursors must match the copied aggregate state.
        # The copied state reflects everything up to the checkpoint, so we
        # position iterators at the reservoir end for heads and at each
        # window's lower bound for tails via a no-op state pass.
        tp._reposition_iterators()
        return tp

    def _reposition_iterators(self) -> None:
        """Move iterators to match already-recovered aggregate state.

        The copied state store reflects every event up to the checkpoint
        (which flushed all chunks to sealed files), so heads seek just past
        the last stored timestamp and tails seek to each window's lower
        bound — random reads via the ts index, not full scans.
        """
        r = self.reservoir
        last_ts = r._index[-1].last_ts if r._index else None
        if last_ts is None:
            return
        for wnode in self.plan.windows.values():
            lo, hi = wnode.spec.bounds(last_ts)
            wnode.head.seek_after(hi)
            if wnode.tail is not None:
                wnode.tail.seek_after(lo)
        self.take_costs()

    def close(self) -> None:
        self.reservoir.close()
