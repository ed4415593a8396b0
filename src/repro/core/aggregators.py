"""Railgun aggregation operators (paper §3.4 grammar, §4.1.3 state layout).

Every aggregator maintains an incremental state supporting the sliding
window protocol:

- ``add(seq, value)``    — a new event entered the window,
- ``evict(seq, value)``  — the oldest event left the window,
- ``value()``            — the current aggregate.

``seq`` is the event's monotonically increasing sequence number inside its
task; it is what the min/max monotonic deques key on (paper cites Knuth's
deque [30]). States are small, picklable objects: the state store
serializes them on every write like the paper's RocksDB-backed store.

stdDev uses Welford's online algorithm (paper ref [50]); eviction uses the
reverse-Welford update, which is numerically fine for the window
populations exercised here. countDistinct keeps a value→multiplicity map
(the paper keeps these counts in a dedicated RocksDB column family).
"""
from __future__ import annotations

import math
from collections import deque
from typing import Any


class Aggregator:
    """Base incremental aggregator over the events currently in a window."""

    name = "base"

    def add(self, seq: int, value: Any) -> None:  # pragma: no cover - abstract
        raise NotImplementedError

    def evict(self, seq: int, value: Any) -> None:  # pragma: no cover - abstract
        raise NotImplementedError

    def value(self) -> Any:  # pragma: no cover - abstract
        raise NotImplementedError


class Count(Aggregator):
    """count(field) — number of events in the window."""

    name = "count"

    def __init__(self) -> None:
        self.n = 0

    def add(self, seq: int, value: Any) -> None:
        self.n += 1

    def evict(self, seq: int, value: Any) -> None:
        self.n -= 1

    def value(self) -> int:
        return self.n


class Sum(Aggregator):
    """sum(field) — one scalar of state, as in the paper's Q1 example."""

    name = "sum"

    def __init__(self) -> None:
        self.s = 0.0
        self.n = 0

    def add(self, seq: int, value: Any) -> None:
        self.s += value
        self.n += 1

    def evict(self, seq: int, value: Any) -> None:
        self.s -= value
        self.n -= 1

    def value(self) -> float | None:
        return self.s if self.n else None


class Avg(Aggregator):
    """avg(field) — stores sum plus the auxiliary counter (§4.1.3)."""

    name = "avg"

    def __init__(self) -> None:
        self.s = 0.0
        self.n = 0

    def add(self, seq: int, value: Any) -> None:
        self.s += value
        self.n += 1

    def evict(self, seq: int, value: Any) -> None:
        self.s -= value
        self.n -= 1

    def value(self) -> float | None:
        return self.s / self.n if self.n else None


class _MonotonicExtreme(Aggregator):
    """Sliding-window extreme via a monotonic deque of (seq, value).

    The deque front is always the current extreme; ``evict`` pops it when
    the expiring event is the one providing it. Amortized O(1) per event.
    """

    _keep: Any  # comparison deciding whether the tail survives a new value

    def __init__(self) -> None:
        self.dq: deque[tuple[int, Any]] = deque()

    def add(self, seq: int, value: Any) -> None:
        while self.dq and not self._keep(self.dq[-1][1], value):
            self.dq.pop()
        self.dq.append((seq, value))

    def evict(self, seq: int, value: Any) -> None:
        if self.dq and self.dq[0][0] == seq:
            self.dq.popleft()

    def value(self) -> Any:
        return self.dq[0][1] if self.dq else None


class Max(_MonotonicExtreme):
    name = "max"

    @staticmethod
    def _keep(tail: Any, new: Any) -> bool:
        return tail > new


class Min(_MonotonicExtreme):
    name = "min"

    @staticmethod
    def _keep(tail: Any, new: Any) -> bool:
        return tail < new


class StdDev(Aggregator):
    """Sample standard deviation via Welford's online algorithm.

    State is the paper's "three parameters" (n, mean, M2). Eviction is the
    inverse Welford step.
    """

    name = "stdDev"

    def __init__(self) -> None:
        self.n = 0
        self.mean = 0.0
        self.m2 = 0.0

    def add(self, seq: int, value: Any) -> None:
        self.n += 1
        d = value - self.mean
        self.mean += d / self.n
        self.m2 += d * (value - self.mean)

    def evict(self, seq: int, value: Any) -> None:
        if self.n == 1:
            self.n, self.mean, self.m2 = 0, 0.0, 0.0
            return
        old_mean = (self.n * self.mean - value) / (self.n - 1)
        self.m2 -= (value - self.mean) * (value - old_mean)
        self.n -= 1
        self.mean = old_mean
        self.m2 = max(self.m2, 0.0)  # guard FP drift

    def value(self) -> float | None:
        if self.n < 2:
            return None
        return math.sqrt(self.m2 / (self.n - 1))


class Last(Aggregator):
    """last(field) — most recent value still in the window."""

    name = "last"

    def __init__(self) -> None:
        self.dq: deque[tuple[int, Any]] = deque()

    def add(self, seq: int, value: Any) -> None:
        self.dq.append((seq, value))

    def evict(self, seq: int, value: Any) -> None:
        if self.dq and self.dq[0][0] == seq:
            self.dq.popleft()

    def value(self) -> Any:
        return self.dq[-1][1] if self.dq else None


class Prev(Last):
    """prev(field) — second most recent value in the window."""

    name = "prev"

    def value(self) -> Any:
        return self.dq[-2][1] if len(self.dq) >= 2 else None


class CountDistinct(Aggregator):
    """countDistinct(field) — value→multiplicity map (§4.1.3 column family)."""

    name = "countDistinct"

    def __init__(self) -> None:
        self.counts: dict[Any, int] = {}

    def add(self, seq: int, value: Any) -> None:
        self.counts[value] = self.counts.get(value, 0) + 1

    def evict(self, seq: int, value: Any) -> None:
        c = self.counts.get(value, 0) - 1
        if c <= 0:
            self.counts.pop(value, None)
        else:
            self.counts[value] = c

    def value(self) -> int:
        return len(self.counts)


AGGREGATORS: dict[str, type[Aggregator]] = {
    a.name: a
    for a in (Count, Sum, Avg, StdDev, Max, Min, Last, Prev, CountDistinct)
}


def make_aggregator(name: str) -> Aggregator:
    """Instantiate an aggregator from its grammar name (Fig 4)."""
    try:
        return AGGREGATORS[name]()
    except KeyError:
        raise ValueError(
            f"unknown aggregation {name!r}; supported: {sorted(AGGREGATORS)}"
        ) from None
