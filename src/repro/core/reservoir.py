"""The event reservoir (paper §4.1.1).

Stores *all* events of one task processor on local disk, while keeping
only a tiny, window-count-bound set of chunks in memory:

- Events are appended to an **open chunk** (a small in-memory list kept
  sorted by timestamp). When the chunk reaches ``chunk_events`` entries it
  is *closed*: optionally parked in a **transition** state for
  ``lateness_ms`` of event time (closed for recent events, still open for
  late ones — the paper's watermark-like knob), then *sealed*: serialized
  column-wise with its schema id, zlib-compressed, and appended to an
  ordered, append-only file. Files seal after ``chunks_per_file`` chunks
  and become immutable.
- An in-memory index of ``(first_ts, file, offset)`` per sealed chunk
  supports random reads (needed when a new window/metric is added).
- **Iterators** read the reservoir in timestamp order. Each iterator holds
  its current chunk directly; when it finishes a chunk it takes the next
  one from the shared **prefetch cache** if present (an *async* load in
  the paper — its CPU cost is accounted in ``discount_s`` so the latency
  harness can keep it off the critical path), otherwise it performs a
  *synchronous* demand load (read + decompress on the critical path —
  exactly the §5.2(b) cache-miss tail-latency story). After moving into a
  chunk, the iterator eagerly prefetches the next one (LRU-evicting: with
  more concurrent iterators than cache slots, prefetched chunks are
  evicted before use and every advance becomes a paid miss — the Fig 9b
  cliff).
- Out-of-order events are accepted while their chunk is open or in
  transition; afterwards they are dropped or timestamp-rewritten to the
  open chunk's first timestamp, per configuration. Events are deduplicated
  by ``id`` against the in-memory (open + transition) chunks.
- A :class:`SchemaRegistry` records event schemas so old chunks can be
  deserialized after schema evolution.
"""
from __future__ import annotations

import bisect
import os
import pickle
import time
import zlib
from collections import OrderedDict
from dataclasses import dataclass
from typing import Any, Iterable

Event = dict  # {'id': ..., 'ts': int epoch-ms, <payload fields>}


class SchemaRegistry:
    """Maps schema ids to field tuples; chunks reference their schema id."""

    def __init__(self) -> None:
        self._schemas: dict[int, tuple[str, ...]] = {}
        self._ids: dict[tuple[str, ...], int] = {}
        self.current_id: int | None = None

    def register(self, fields: Iterable[str]) -> int:
        key = tuple(fields)
        sid = self._ids.get(key)
        if sid is None:
            sid = len(self._schemas)
            self._schemas[sid] = key
            self._ids[key] = sid
        self.current_id = sid
        return sid

    def get(self, sid: int) -> tuple[str, ...]:
        return self._schemas[sid]

    def __len__(self) -> int:
        return len(self._schemas)


@dataclass
class ChunkRef:
    """Index entry for one sealed chunk."""

    chunk_id: int
    first_ts: int
    last_ts: int
    n: int
    file_idx: int
    offset: int
    length: int
    schema_id: int


class _PrefetchCache:
    """LRU cache of decompressed chunks, shared by all iterators.

    Only *prefetch* loads insert; demand loads are handed straight to the
    requesting iterator. ``capacity`` is the paper's "chunk elements in
    cache" knob (220 in §5.2(b)).
    """

    def __init__(self, capacity: int) -> None:
        self.capacity = capacity
        self._d: OrderedDict[int, list[Event]] = OrderedDict()
        self._pending: dict[int, int] = {}  # outstanding reservations
        self.hits = 0
        self.misses = 0
        self.evictions = 0

    def reserve(self, chunk_id: int) -> bool:
        """Piggyback on an already-prefetched chunk (no extra slot/load).

        Returns False when absent — the caller must load and ``put``.
        """
        if chunk_id in self._d:
            self._pending[chunk_id] += 1
            self._d.move_to_end(chunk_id)
            return True
        return False

    def take(self, chunk_id: int) -> list[Event] | None:
        """Consume one reservation; the chunk is dropped when none remain."""
        ev = self._d.get(chunk_id)
        if ev is None:
            self.misses += 1
            return None
        self.hits += 1
        self._pending[chunk_id] -= 1
        if self._pending[chunk_id] <= 0:
            del self._d[chunk_id]
            del self._pending[chunk_id]
        return ev

    def put(self, chunk_id: int, events: list[Event]) -> None:
        if chunk_id in self._d:
            self._pending[chunk_id] += 1
            self._d.move_to_end(chunk_id)
            return
        while len(self._d) >= self.capacity:
            old, _ = self._d.popitem(last=False)
            self._pending.pop(old, None)
            self.evictions += 1
        self._d[chunk_id] = events
        self._pending[chunk_id] = 1

    def __contains__(self, chunk_id: int) -> bool:
        return chunk_id in self._d

    def __len__(self) -> int:
        return len(self._d)


class ReservoirIterator:
    """Timestamp-ordered cursor over the reservoir (a window head or tail).

    Position is ``(chunk_id, idx)``; ``advance_until`` yields every event
    with ``ts <= bound`` not yet yielded, loading chunks as needed.
    """

    def __init__(self, reservoir: "EventReservoir", chunk_id: int, idx: int):
        self.r = reservoir
        self.chunk_id = chunk_id
        self.idx = idx
        self._current: list[Event] | None = None  # sealed chunks only
        reservoir._iterators.append(self)

    def close(self) -> None:
        self.r._iterators.remove(self)
        self._current = None

    def position(self) -> tuple[int, int]:
        return (self.chunk_id, self.idx)

    def _events_of_current(self) -> list[Event]:
        r = self.r
        if self.chunk_id == r._open_id:
            return r._open
        for cid, events, _ in r._transition:
            if cid == self.chunk_id:
                return events
        if self._current is None:
            self._current = r._fetch_sealed(self.chunk_id, prefetch=True)
        return self._current

    def advance_until(self, bound_ts: int, out: list[Event]) -> None:
        """Append to ``out`` all not-yet-yielded events with ts <= bound."""
        r = self.r
        while True:
            events = self._events_of_current()
            n = len(events)
            while self.idx < n and events[self.idx]["ts"] <= bound_ts:
                out.append(events[self.idx])
                self.idx += 1
            if self.idx < n or self.chunk_id >= r._open_id:
                return  # blocked on bound, or caught up with the head
            self.chunk_id += 1
            self.idx = 0
            self._current = None

    def seek_after(self, bound_ts: int) -> None:
        """Position the cursor just past every event with ts <= bound.

        Uses the in-memory ts index (a random read, §4.1.1) instead of
        scanning — how a recovering or newly-added window attaches.
        """
        r = self.r
        self._current = None
        firsts = [c.first_ts for c in r._index]
        lo = bisect.bisect_right(firsts, bound_ts) - 1
        if lo < 0:
            self.chunk_id, self.idx = 0, 0
            return
        ref = r._index[lo]
        if bound_ts >= ref.last_ts:
            self.chunk_id, self.idx = lo + 1, 0
            return
        events = r._fetch_sealed(lo, prefetch=False)
        self.idx = bisect.bisect_right([e["ts"] for e in events], bound_ts)
        self.chunk_id = lo
        self._current = events

    def peek_ts(self) -> int | None:
        """Timestamp of the next event, or None if caught up."""
        r = self.r
        cid, idx = self.chunk_id, self.idx
        cur = self._current
        while True:
            if cid == r._open_id:
                return r._open[idx]["ts"] if idx < len(r._open) else None
            events = None
            for tcid, tev, _ in r._transition:
                if tcid == cid:
                    events = tev
                    break
            if events is None:
                events = cur if (cur is not None and cid == self.chunk_id) else None
                if events is None:
                    ref = r._index[cid]
                    if idx < ref.n:
                        # peek without paying a demand load: first_ts suffices
                        return ref.first_ts if idx == 0 else None
                    cid += 1
                    idx = 0
                    continue
            if idx < len(events):
                return events[idx]["ts"]
            cid += 1
            idx = 0
            cur = None


class EventReservoir:
    """Disk-backed, chunked store of one task's events (paper §4.1.1)."""

    def __init__(
        self,
        data_dir: str,
        *,
        chunk_events: int = 512,
        chunks_per_file: int = 64,
        cache_chunks: int = 128,
        out_of_order: str = "drop",  # or "rewrite"
        lateness_ms: int = 0,
        io_read_cost_us: float = 25.0,
        io_seek_cost_us: float = 0.0,
        io_seek_every: int = 0,
        schema: Iterable[str] | None = None,
    ) -> None:
        if out_of_order not in ("drop", "rewrite"):
            raise ValueError("out_of_order must be 'drop' or 'rewrite'")
        os.makedirs(data_dir, exist_ok=True)
        self.dir = data_dir
        self.chunk_events = chunk_events
        self.chunks_per_file = chunks_per_file
        self.out_of_order = out_of_order
        self.lateness_ms = lateness_ms
        self.io_read_cost_us = io_read_cost_us
        # §5.2(b) worst case: when prefetch is defeated, some demand loads
        # miss the OS page cache too and pay a full IO seek. Deterministic
        # model: every `io_seek_every`-th demand load pays `io_seek_cost_us`.
        self.io_seek_cost_us = io_seek_cost_us
        self.io_seek_every = io_seek_every
        self.registry = SchemaRegistry()
        if schema is not None:
            self.registry.register(schema)
        self.cache = _PrefetchCache(cache_chunks)
        # Freshly sealed chunks linger in memory (they were just the open
        # chunk; persistence is asynchronous — paper footnotes 3–4), so
        # iterators trailing just behind the frontier read them for free.
        self._recent: OrderedDict[int, list[Event]] = OrderedDict()
        self._recent_cap = 3
        self.recent_hits = 0

        self._index: list[ChunkRef] = []  # sealed chunks, position == chunk_id
        self._transition: list[tuple[int, list[Event], int]] = []  # (cid, evs, close_ts)
        self._open: list[Event] = []
        self._open_id = 0
        self._dedup: dict[Any, int] = {}  # event id -> chunk id (in-memory chunks)
        self._iterators: list[ReservoirIterator] = []
        self._files: list[str] = []
        self._write_fh = None
        self._read_fds: dict[int, int] = {}
        self._last_sealed_ts: int | None = None
        self._last_closed_ts: int | None = None  # max ts at chunk *closure*
        self.total_events = 0
        self.dropped_late = 0
        self.rewritten_late = 0
        self.dropped_dups = 0
        self.demand_loads = 0
        self.prefetch_loads = 0
        # seconds of CPU spent on prefetch loads this call — asynchronous in
        # the paper, so the latency harness subtracts it from service time.
        self.discount_s = 0.0
        # synthetic syscall/page-cache cost for paid (demand) loads, µs.
        self.synthetic_us = 0.0

    # -- file plumbing ------------------------------------------------------

    def _file_path(self, idx: int) -> str:
        return os.path.join(self.dir, f"reservoir-{idx:06d}.bin")

    def _current_file(self) -> tuple[int, Any]:
        if self._write_fh is None or self._chunks_in_current_file >= self.chunks_per_file:
            if self._write_fh is not None:
                self._write_fh.close()
            idx = len(self._files)
            path = self._file_path(idx)
            self._files.append(path)
            self._write_fh = open(path, "ab")
            self._chunks_in_current_file = 0
        return len(self._files) - 1, self._write_fh

    _chunks_in_current_file = 0

    # -- append path --------------------------------------------------------

    def append(self, event: Event) -> tuple[str, int, int]:
        """Store one event.

        Returns ``(status, chunk_id, pos)`` where status is one of
        ``"ok"``, ``"late-rewritten"``, ``"dup"``, ``"late-dropped"``;
        chunk_id/pos are the insertion point (-1, -1 when not stored).
        Late (out-of-order) events may be inserted *behind* live iterator
        positions; registered iterators are index-shifted so they neither
        skip nor double-read (the window operator decides whether to apply
        the late event manually — see plan.py).
        """
        eid = event.get("id")
        if eid is not None and eid in self._dedup:
            self.dropped_dups += 1
            return ("dup", -1, -1)
        ts = event["ts"]
        status = "ok"
        self._seal_expired_transitions(ts)
        if self._last_closed_ts is not None and ts <= self._last_closed_ts:
            tchunk = self._find_transition(ts)
            if tchunk is None:
                if self.out_of_order == "drop":
                    self.dropped_late += 1
                    return ("late-dropped", -1, -1)
                ts = self._open[0]["ts"] if self._open else self._last_closed_ts + 1
                event = dict(event, ts=ts)
                status = "late-rewritten"
                self.rewritten_late += 1
                target_id, target = self._open_id, self._open
            else:
                target_id, target = tchunk
        else:
            target_id, target = self._open_id, self._open

        pos = self._sorted_insert(target_id, target, event)
        if eid is not None:
            self._dedup[eid] = target_id
        self.total_events += 1
        if target_id == self._open_id and len(self._open) >= self.chunk_events:
            self._close_open()
        return (status, target_id, pos)

    def _sorted_insert(self, chunk_id: int, chunk: list[Event], event: Event) -> int:
        ts = event["ts"]
        if not chunk or chunk[-1]["ts"] <= ts:
            chunk.append(event)
            return len(chunk) - 1
        pos = bisect.bisect_right([e["ts"] for e in chunk], ts)
        chunk.insert(pos, event)
        for it in self._iterators:
            if it.chunk_id == chunk_id and it.idx > pos:
                it.idx += 1
        return pos

    def _find_transition(self, ts: int) -> tuple[int, list[Event]] | None:
        # newest transition chunk whose range admits ts
        for cid, events, _close_ts in reversed(self._transition):
            if events and events[0]["ts"] <= ts:
                return (cid, events)
        return None

    def _close_open(self) -> None:
        if not self._open:
            return
        cid, events = self._open_id, self._open
        close_ts = events[-1]["ts"]
        self._open = []
        self._open_id = cid + 1
        self._last_closed_ts = close_ts
        if self.lateness_ms > 0:
            self._transition.append((cid, events, close_ts))
        else:
            self._seal(cid, events)

    def _seal_expired_transitions(self, now_ts: int) -> None:
        while self._transition and self._transition[0][2] + self.lateness_ms < now_ts:
            cid, events, _ = self._transition.pop(0)
            self._seal(cid, events)

    def _seal(self, chunk_id: int, events: list[Event]) -> None:
        assert chunk_id == len(self._index), "chunks seal in order"
        sid = self.registry.current_id
        if sid is None:
            sid = self.registry.register(sorted(set().union(*(e.keys() for e in events))))
        fields = self.registry.get(sid)
        cols = tuple([e.get(f) for e in events] for f in fields)
        blob = zlib.compress(pickle.dumps((sid, cols), protocol=pickle.HIGHEST_PROTOCOL), 6)
        file_idx, fh = self._current_file()
        offset = fh.tell()
        fh.write(blob)
        fh.flush()
        self._chunks_in_current_file += 1
        self._recent[chunk_id] = events
        while len(self._recent) > self._recent_cap:
            self._recent.popitem(last=False)
        self._index.append(
            ChunkRef(
                chunk_id=chunk_id,
                first_ts=events[0]["ts"],
                last_ts=events[-1]["ts"],
                n=len(events),
                file_idx=file_idx,
                offset=offset,
                length=len(blob),
                schema_id=sid,
            )
        )
        self._last_sealed_ts = events[-1]["ts"]
        for e in events:
            eid = e.get("id")
            if eid is not None:
                self._dedup.pop(eid, None)

    # -- read path -----------------------------------------------------------

    def _read_blob(self, ref: ChunkRef) -> bytes:
        fd = self._read_fds.get(ref.file_idx)
        if fd is None:
            fd = os.open(self._files[ref.file_idx], os.O_RDONLY)
            self._read_fds[ref.file_idx] = fd
        return os.pread(fd, ref.length, ref.offset)

    def _decode(self, blob: bytes) -> list[Event]:
        sid, cols = pickle.loads(zlib.decompress(blob))
        fields = self.registry.get(sid)
        return [dict(zip(fields, row)) for row in zip(*cols)] if cols and cols[0] else []

    def _load_sealed(self, chunk_id: int) -> list[Event]:
        return self._decode(self._read_blob(self._index[chunk_id]))

    def _fetch_sealed(self, chunk_id: int, *, prefetch: bool) -> list[Event]:
        """Fetch a sealed chunk for iteration.

        Cache hit → free. Miss → *demand load* on the critical path
        (+ synthetic page-cache/syscall cost). Either way, eagerly prefetch
        the next sealed chunk into the shared cache, with its CPU time
        accumulated into ``discount_s`` (async in the paper).
        """
        recent = self._recent.get(chunk_id)
        if recent is not None:
            self.recent_hits += 1
            if prefetch:
                self._prefetch(chunk_id + 1)
            return recent
        events = self.cache.take(chunk_id)
        if events is None:
            self.demand_loads += 1
            self.synthetic_us += self.io_read_cost_us
            if self.io_seek_every and self.demand_loads % self.io_seek_every == 0:
                self.synthetic_us += self.io_seek_cost_us
            events = self._load_sealed(chunk_id)
        if prefetch:
            self._prefetch(chunk_id + 1)
        return events

    def _prefetch(self, chunk_id: int) -> None:
        """Asynchronously stage a chunk for its next reader.

        If another iterator already staged it, just add a reservation —
        the loaded copy serves every reader (shared cache). The CPU time
        goes to ``discount_s``: prefetching is off the critical path.
        """
        if chunk_id >= len(self._index):
            return  # not sealed yet
        if self.cache.reserve(chunk_id):
            return
        t0 = time.perf_counter()
        self.cache.put(chunk_id, self._load_sealed(chunk_id))
        self.prefetch_loads += 1
        self.discount_s += time.perf_counter() - t0

    def iterator(self, *, from_ts: int | None = None) -> ReservoirIterator:
        """Open a cursor; ``from_ts`` seeks via the ts index (random read)."""
        if from_ts is None:
            return ReservoirIterator(self, 0, 0)
        lo = bisect.bisect_right([c.first_ts for c in self._index], from_ts) - 1
        if lo < 0:
            return ReservoirIterator(self, 0, 0)
        ref = self._index[lo]
        if from_ts > ref.last_ts:
            return ReservoirIterator(self, lo + 1, 0)
        events = self._fetch_sealed(lo, prefetch=False)
        idx = bisect.bisect_left([e["ts"] for e in events], from_ts)
        it = ReservoirIterator(self, lo, idx)
        it._current = events
        return it

    # -- accounting / checkpoint ----------------------------------------------

    def reset_stats(self) -> None:
        """Zero the load/hit counters (to report steady state after warm-up)."""
        self.demand_loads = 0
        self.prefetch_loads = 0
        self.recent_hits = 0
        self.cache.hits = 0
        self.cache.misses = 0
        self.cache.evictions = 0

    def take_costs(self) -> tuple[float, float]:
        """Return and reset (synthetic_us, discount_s) for the harness."""
        s, d = self.synthetic_us, self.discount_s
        self.synthetic_us, self.discount_s = 0.0, 0.0
        return s, d

    def memory_events(self) -> int:
        """Events currently held in memory (open + transition + cache)."""
        cached = sum(len(v) for v in self.cache._d.values())
        cached += sum(len(v) for v in self._recent.values())
        trans = sum(len(e) for _, e, _ in self._transition)
        held = sum(
            len(it._current) for it in self._iterators if it._current is not None
        )
        return len(self._open) + trans + cached + held

    def sealed_chunks(self) -> int:
        return len(self._index)

    def disk_bytes(self) -> int:
        return sum(c.length for c in self._index)

    def flush(self) -> None:
        """Seal everything in memory (used by checkpoints and shutdown)."""
        for cid, events, _ in self._transition:
            self._seal(cid, events)
        self._transition = []
        self._close_open_forced()

    def _close_open_forced(self) -> None:
        if self._open:
            cid, events = self._open_id, self._open
            self._open = []
            self._open_id = cid + 1
            self._last_closed_ts = events[-1]["ts"]
            self._seal(cid, events)

    def checkpoint(self) -> dict:
        """Seal in-memory chunks and return restorable metadata."""
        self.flush()
        return {
            "index": list(self._index),
            "files": list(self._files),
            "open_id": self._open_id,
            "schemas": dict(self.registry._schemas),
            "total_events": self.total_events,
        }

    @classmethod
    def restore(cls, data_dir: str, meta: dict, **kwargs) -> "EventReservoir":
        """Rebuild a reservoir from checkpoint metadata + copied files."""
        r = cls(data_dir, **kwargs)
        r._index = list(meta["index"])
        r._files = [
            os.path.join(data_dir, os.path.basename(p)) for p in meta["files"]
        ]
        r._open_id = meta["open_id"]
        r.total_events = meta["total_events"]
        for sid, fields in sorted(meta["schemas"].items()):
            r.registry.register(fields)
        if r._index:
            r._last_sealed_ts = r._index[-1].last_ts
            r._last_closed_ts = r._index[-1].last_ts
        # reopen the last file for appends if it is not full
        if r._files:
            last_file = len(r._files) - 1
            n_in_last = sum(1 for c in r._index if c.file_idx == last_file)
            r._write_fh = open(r._files[-1], "ab")
            r._chunks_in_current_file = n_in_last
        return r

    def close(self) -> None:
        if self._write_fh is not None:
            self._write_fh.close()
            self._write_fh = None
        for fd in self._read_fds.values():
            os.close(fd)
        self._read_fds.clear()
