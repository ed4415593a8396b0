"""Vectorized FIFO queueing via the Lindley recursion.

For a single-server FIFO queue with arrival times ``T_i`` (non-decreasing)
and service times ``S_i``, departures satisfy

    D_i = max(D_{i-1}, T_i) + S_i
        = C_i + max_{j <= i} (T_j - C_{j-1}),   C_i = S_1 + ... + S_i

which turns the sequential recursion into a cumulative sum plus a running
maximum — both O(n) numpy primitives. Sojourn (latency) = D - T. This is
what both the single-engine harness (T1–T3) and the multi-stage cluster
model (T4) run on.
"""
from __future__ import annotations

import numpy as np


def fifo_departures(arrivals: np.ndarray, services: np.ndarray) -> np.ndarray:
    """Departure times of a FIFO single-server queue (vectorized Lindley)."""
    arrivals = np.asarray(arrivals, dtype=np.float64)
    services = np.asarray(services, dtype=np.float64)
    if arrivals.shape != services.shape:
        raise ValueError("arrivals and services must have equal length")
    if len(arrivals) == 0:
        return np.empty(0)
    if np.any(np.diff(arrivals) < 0):
        raise ValueError("arrivals must be non-decreasing (FIFO order)")
    csum = np.cumsum(services)
    prev = np.concatenate(([0.0], csum[:-1]))
    return csum + np.maximum.accumulate(arrivals - prev)


def staged_departures(
    arrivals: np.ndarray,
    queue_of_event: np.ndarray,
    services: np.ndarray,
    n_queues: int,
) -> np.ndarray:
    """Departures when events fan out over ``n_queues`` parallel FIFO queues.

    ``queue_of_event[i]`` selects event *i*'s queue; within each queue,
    events are served in arrival (FIFO) order. Arrivals need not be
    pre-sorted — each queue's subsequence is sorted here, which is what
    happens when a stage merges several upstream queues (e.g. many
    partitions feeding one reply broker).
    """
    arrivals = np.asarray(arrivals, dtype=np.float64)
    services = np.asarray(services, dtype=np.float64)
    out = np.empty_like(arrivals)
    order = np.argsort(queue_of_event, kind="stable")
    sorted_q = queue_of_event[order]
    bounds = np.searchsorted(sorted_q, np.arange(n_queues + 1))
    for q in range(n_queues):
        idx = order[bounds[q]: bounds[q + 1]]
        if len(idx) == 0:
            continue
        sub = idx[np.argsort(arrivals[idx], kind="stable")]
        out[sub] = fifo_departures(arrivals[sub], services[sub])
    return out


def percentiles_ms(latencies_s: np.ndarray, pcts=(50, 90, 99, 99.9)) -> dict[str, float]:
    """Latency percentiles in milliseconds, keyed 'p50', ..., 'p99.9'."""
    if len(latencies_s) == 0:
        return {f"p{p:g}": float("nan") for p in pcts}
    vals = np.percentile(latencies_s, pcts) * 1e3
    return {f"p{p:g}": float(v) for p, v in zip(pcts, vals)}
