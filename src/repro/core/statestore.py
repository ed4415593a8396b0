"""Embedded aggregation state store (paper §4.1.3).

The paper uses RocksDB; Python bindings for RocksDB are unavailable
offline, so this is an embedded key-value store with the same *cost
shape*: every read/write pays value (de)serialization (pickle), values
live in column families (countDistinct uses its own, as in the paper),
and checkpoints flush the store to disk so recovery can copy it.

A per-access synthetic cost knob (``access_cost_us``) lets experiments
model an embedded store slower than a Python dict (e.g. RocksDB via JNI);
it accumulates into ``synthetic_us`` which the latency harness adds to
measured service time. The default is 0 (pay only the real ser/de cost).
"""
from __future__ import annotations

import os
import pickle
from typing import Any, Iterator


class StateStore:
    """Column-family key-value store with pickled values + checkpointing."""

    DEFAULT_CF = "default"

    def __init__(self, data_dir: str | None = None, *, access_cost_us: float = 0.0):
        self.dir = data_dir
        if data_dir:
            os.makedirs(data_dir, exist_ok=True)
        self._cfs: dict[str, dict[Any, bytes]] = {self.DEFAULT_CF: {}}
        self.access_cost_us = access_cost_us
        self.synthetic_us = 0.0
        self.gets = 0
        self.puts = 0

    def _cf(self, cf: str) -> dict[Any, bytes]:
        d = self._cfs.get(cf)
        if d is None:
            d = self._cfs[cf] = {}
        return d

    def get(self, key: Any, cf: str = DEFAULT_CF) -> Any | None:
        self.gets += 1
        self.synthetic_us += self.access_cost_us
        blob = self._cf(cf).get(key)
        return None if blob is None else pickle.loads(blob)

    def put(self, key: Any, value: Any, cf: str = DEFAULT_CF) -> None:
        self.puts += 1
        self.synthetic_us += self.access_cost_us
        self._cf(cf)[key] = pickle.dumps(value, protocol=pickle.HIGHEST_PROTOCOL)

    def delete(self, key: Any, cf: str = DEFAULT_CF) -> None:
        self._cf(cf).pop(key, None)

    def keys(self, cf: str = DEFAULT_CF) -> Iterator[Any]:
        return iter(self._cf(cf).keys())

    def __len__(self) -> int:
        return sum(len(d) for d in self._cfs.values())

    def take_costs(self) -> float:
        s = self.synthetic_us
        self.synthetic_us = 0.0
        return s

    # -- checkpointing ---------------------------------------------------

    def checkpoint(self, tag: str = "ckpt") -> str:
        """Flush the store to ``<dir>/<tag>.state``; returns the path."""
        if not self.dir:
            raise RuntimeError("state store has no data_dir; cannot checkpoint")
        path = os.path.join(self.dir, f"{tag}.state")
        with open(path, "wb") as fh:
            pickle.dump(self._cfs, fh, protocol=pickle.HIGHEST_PROTOCOL)
        return path

    @classmethod
    def restore(cls, path: str, data_dir: str | None = None, **kwargs) -> "StateStore":
        store = cls(data_dir, **kwargs)
        with open(path, "rb") as fh:
            store._cfs = pickle.load(fh)
        return store
