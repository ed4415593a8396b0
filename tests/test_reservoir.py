"""Tests for the event reservoir (paper §4.1.1)."""
import os

import pytest

from repro.core.reservoir import EventReservoir


def _ev(i, ts=None, **extra):
    return {"id": i, "ts": ts if ts is not None else i * 10, "v": float(i), **extra}


def make(tmp_path, **kw):
    kw.setdefault("chunk_events", 8)
    kw.setdefault("chunks_per_file", 4)
    kw.setdefault("cache_chunks", 16)
    kw.setdefault("schema", ("id", "ts", "v", "seq"))
    return EventReservoir(str(tmp_path / "res"), **kw)


def _fill(r, n, start=0):
    for i in range(start, start + n):
        e = _ev(i)
        e["seq"] = i
        assert r.append(e)[0] == "ok"


# -- chunking / persistence ---------------------------------------------------

def test_chunks_seal_at_capacity(tmp_path):
    r = make(tmp_path)
    _fill(r, 8)
    assert r.sealed_chunks() == 1
    assert r.total_events == 8
    _fill(r, 7, start=8)
    assert r.sealed_chunks() == 1  # second chunk still open


def test_files_rotate_after_max_chunks(tmp_path):
    r = make(tmp_path)
    _fill(r, 8 * 5)  # 5 chunks, 4 per file
    assert r.sealed_chunks() == 5
    assert len(r._files) == 2
    assert all(os.path.exists(p) for p in r._files)


def test_iteration_roundtrip_all_events(tmp_path):
    r = make(tmp_path)
    _fill(r, 50)
    it = r.iterator()
    out = []
    it.advance_until(10**9, out)
    assert [e["id"] for e in out] == list(range(50))
    assert [e["v"] for e in out] == [float(i) for i in range(50)]


def test_iterator_advance_respects_bound(tmp_path):
    r = make(tmp_path)
    _fill(r, 50)
    it = r.iterator()
    out = []
    it.advance_until(195, out)  # events have ts = 10*i; 195 admits i<=19
    assert [e["id"] for e in out] == list(range(20))
    out2 = []
    it.advance_until(205, out2)
    assert [e["id"] for e in out2] == [20]


def test_iterator_interleaved_with_appends(tmp_path):
    """Head-iterator pattern: consume each event as it arrives."""
    r = make(tmp_path)
    it = r.iterator()
    seen = []
    for i in range(40):
        e = _ev(i)
        e["seq"] = i
        r.append(e)
        it.advance_until(e["ts"], seen)
    assert [e["id"] for e in seen] == list(range(40))


def test_two_iterators_are_independent(tmp_path):
    r = make(tmp_path)
    _fill(r, 32)
    a, b = r.iterator(), r.iterator()
    out_a, out_b = [], []
    a.advance_until(150, out_a)
    b.advance_until(75, out_b)
    assert len(out_a) == 16 and len(out_b) == 8


def test_random_read_via_ts_index(tmp_path):
    r = make(tmp_path)
    _fill(r, 64)
    it = r.iterator(from_ts=305)  # first event with ts >= 305 is id 31
    out = []
    it.advance_until(345, out)
    assert [e["id"] for e in out] == [31, 32, 33, 34]


def test_seek_after_positions_past_bound(tmp_path):
    r = make(tmp_path)
    _fill(r, 64)
    it = r.iterator()
    it.seek_after(299)
    out = []
    it.advance_until(10**9, out)
    assert out[0]["id"] == 30  # ts 300 is the first > 299


def test_compression_on_disk(tmp_path):
    r = make(tmp_path, chunk_events=128)
    _fill(r, 1024)
    # column-wise pickled + zlib: far smaller than raw pickled dicts
    import pickle

    raw = len(pickle.dumps([_ev(i) for i in range(1024)]))
    assert r.disk_bytes() < raw / 2


# -- dedup / out-of-order -------------------------------------------------------

def test_duplicate_ids_dropped_against_in_memory_chunks(tmp_path):
    r = make(tmp_path)
    e = _ev(1)
    e["seq"] = 0
    assert r.append(e)[0] == "ok"
    assert r.append(dict(e))[0] == "dup"
    assert r.total_events == 1
    assert r.dropped_dups == 1


def test_late_event_dropped_by_policy(tmp_path):
    r = make(tmp_path, out_of_order="drop")
    _fill(r, 16)  # seals chunk 0 (ts 0..70), chunk 1 open (ts 80..150)
    late = {"id": "late", "ts": 5, "v": 99.0, "seq": 99}
    status, cid, pos = r.append(late)
    assert status == "late-dropped"
    assert r.dropped_late == 1


def test_late_event_rewritten_by_policy(tmp_path):
    r = make(tmp_path, out_of_order="rewrite")
    _fill(r, 12)  # chunk 0 sealed (ts 0..70); open chunk holds ts 80..110
    late = {"id": "late", "ts": 5, "v": 99.0, "seq": 99}
    status, cid, pos = r.append(late)
    assert status == "late-rewritten"
    assert r.rewritten_late == 1
    it = r.iterator()
    out = []
    it.advance_until(10**9, out)
    rewritten = [e for e in out if e["id"] == "late"][0]
    assert rewritten["ts"] == 80  # first timestamp of the open chunk


def test_out_of_order_within_open_chunk_sorted_insert(tmp_path):
    r = make(tmp_path, chunk_events=64)
    for i, ts in enumerate([100, 200, 300]):
        r.append({"id": i, "ts": ts, "v": 0.0, "seq": i})
    status, cid, pos = r.append({"id": 9, "ts": 150, "v": 0.0, "seq": 3})
    assert status == "ok" and pos == 1
    out = []
    r.iterator().advance_until(10**9, out)
    assert [e["ts"] for e in out] == [100, 150, 200, 300]


def test_out_of_order_insert_shifts_live_iterators(tmp_path):
    r = make(tmp_path, chunk_events=64)
    it = r.iterator()
    out = []
    for i, ts in enumerate([100, 200, 300]):
        r.append({"id": i, "ts": ts, "v": 0.0, "seq": i})
        it.advance_until(ts, out)
    assert len(out) == 3
    r.append({"id": 9, "ts": 150, "v": 0.0, "seq": 3})
    # the iterator's position was shifted; it must not re-yield 200/300
    more = []
    it.advance_until(10**9, more)
    assert more == []


def test_lateness_transition_chunks_accept_late_events(tmp_path):
    r = make(tmp_path, lateness_ms=1000, chunk_events=4)
    for i in range(8):  # two chunks; first closes at ts 30 → transition
        r.append({"id": i, "ts": i * 10, "v": 0.0, "seq": i})
    assert r.sealed_chunks() == 0  # chunk 0 is in transition, not sealed
    status, cid, pos = r.append({"id": "late", "ts": 15, "v": 1.0, "seq": 8})
    assert status == "ok"
    out = []
    r.iterator().advance_until(10**9, out)
    assert [e["ts"] for e in out] == [0, 10, 15, 20, 30, 40, 50, 60, 70]


def test_transition_chunks_seal_after_lateness_expires(tmp_path):
    r = make(tmp_path, lateness_ms=100, chunk_events=4)
    for i in range(8):
        r.append({"id": i, "ts": i * 10, "v": 0.0, "seq": i})
    assert r.sealed_chunks() == 0
    r.append({"id": 99, "ts": 500, "v": 0.0, "seq": 8})  # advances event time
    assert r.sealed_chunks() >= 1  # chunk 0 (close_ts 30) sealed: 30+100 < 500


# -- prefetch cache --------------------------------------------------------------

def test_prefetch_makes_sequential_reads_cache_hits(tmp_path):
    r = make(tmp_path, cache_chunks=8)
    _fill(r, 8 * 10)
    it = r.iterator()
    out = []
    it.advance_until(10**9, out)
    assert len(out) == 80
    # chunk 0 is a demand load; chunks 1.. come from prefetch, except the
    # freshly sealed tail of the reservoir, served from the recent buffer
    assert r.demand_loads == 1
    assert r.cache.hits + r.recent_hits >= 8


def test_cache_thrash_when_more_iterators_than_slots(tmp_path):
    """The Fig 9b cliff: iterators > cache slots ⇒ prefetches evicted ⇒ misses."""
    n_chunks, stride = 70, 6

    def run(cache_slots, n_iters):
        r = make(tmp_path / f"c{cache_slots}i{n_iters}", cache_chunks=cache_slots)
        _fill(r, 8 * n_chunks)
        # misaligned iterators (the Fig 9b setup): far apart in the
        # reservoir, like the tails of windows with very different sizes
        iters = []
        for j in range(n_iters):
            it = r.iterator()
            it.seek_after(j * stride * 80 - 5)
            iters.append(it)
        r.demand_loads = 0
        r.cache.hits = r.cache.misses = 0
        steps = n_chunks - stride * n_iters
        for step in range(1, steps):
            for j, it in enumerate(iters):
                sink = []
                it.advance_until((j * stride + step) * 80 - 5, sink)
        return r.demand_loads / max(1, r.demand_loads + r.cache.hits)

    miss_small = run(cache_slots=16, n_iters=4)
    miss_big = run(cache_slots=4, n_iters=8)
    assert miss_small < 0.3
    assert miss_big > 0.7


def test_memory_events_bounded_by_iterators_not_history(tmp_path):
    """§4.1.1: windows of years cost the same memory as windows of seconds."""
    r1 = make(tmp_path / "small", cache_chunks=4)
    _fill(r1, 8 * 20)
    r2 = make(tmp_path / "large", cache_chunks=4)
    _fill(r2, 8 * 200)  # 10x the history
    for r in (r1, r2):
        it = r.iterator()
        sink = []
        it.advance_until(50, sink)
    assert r2.memory_events() <= r1.memory_events() + 8 * 5


# -- schema registry --------------------------------------------------------------

def test_schema_evolution_roundtrip(tmp_path):
    r = EventReservoir(
        str(tmp_path / "res"), chunk_events=4, schema=("id", "ts", "v", "seq")
    )
    for i in range(4):
        r.append({"id": i, "ts": i * 10, "v": float(i), "seq": i})
    r.registry.register(("id", "ts", "v", "w", "seq"))  # schema evolves
    for i in range(4, 8):
        r.append({"id": i, "ts": i * 10, "v": float(i), "w": i * 2.0, "seq": i})
    out = []
    r.iterator().advance_until(10**9, out)
    assert "w" not in out[0] or out[0]["w"] is None  # old schema chunk
    assert out[-1]["w"] == 14.0  # new schema chunk
    assert len(r.registry) == 2


# -- checkpoint / restore -----------------------------------------------------------

def test_checkpoint_restore_roundtrip(tmp_path):
    r = make(tmp_path)
    _fill(r, 30)
    meta = r.checkpoint()
    assert r.sealed_chunks() == 4  # 30 events / 8 per chunk, flushed
    r2 = EventReservoir.restore(
        str(tmp_path / "res"), meta, chunk_events=8, chunks_per_file=4,
        schema=("id", "ts", "v", "seq"),
    )
    out = []
    r2.iterator().advance_until(10**9, out)
    assert [e["id"] for e in out] == list(range(30))
    # restored reservoir accepts further appends
    r2.append({"id": 30, "ts": 300, "v": 30.0, "seq": 30})
    assert r2.total_events == 31


def test_costs_accounting(tmp_path):
    r = make(tmp_path, cache_chunks=8, io_read_cost_us=25.0)
    _fill(r, 8 * 6)
    it = r.iterator()
    sink = []
    it.advance_until(10**9, sink)
    syn, disc = r.take_costs()
    assert syn == pytest.approx(25.0)  # one demand load
    assert disc > 0  # prefetch CPU time was accounted for discounting
    assert r.take_costs() == (0.0, 0.0)  # reset
