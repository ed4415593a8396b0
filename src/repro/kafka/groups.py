"""Consumer-group membership tracking (paper §3.3).

Kafka actively monitors consumers through periodic heartbeats and
triggers a rebalance whenever the consumer landscape changes. This
coordinator reproduces that contract in simulated time:

- consumers ``join``/``leave`` groups and must ``heartbeat`` within the
  session timeout, or ``expire`` declares them failed;
- every membership change bumps the group's *generation* and invokes the
  registered rebalance listener (Railgun's assignment strategy plugs in
  there, see ``repro.engine.cluster``).
"""
from __future__ import annotations

from typing import Callable


class GroupCoordinator:
    """Heartbeat-driven membership + rebalance notification per group."""

    def __init__(self, session_timeout_ms: int = 10_000):
        self.session_timeout_ms = session_timeout_ms
        self._members: dict[str, dict[str, int]] = {}  # group -> member -> last hb
        self.generation: dict[str, int] = {}
        self._listeners: dict[str, Callable[[list[str]], None]] = {}

    def on_rebalance(self, group: str, fn: Callable[[list[str]], None]) -> None:
        """Register the callback invoked with the live member list."""
        self._listeners[group] = fn

    def members(self, group: str) -> list[str]:
        return sorted(self._members.get(group, {}))

    def _changed(self, group: str) -> None:
        self.generation[group] = self.generation.get(group, 0) + 1
        fn = self._listeners.get(group)
        if fn is not None:
            fn(self.members(group))

    def join(self, group: str, member: str, now_ms: int) -> None:
        g = self._members.setdefault(group, {})
        fresh = member not in g
        g[member] = now_ms
        if fresh:
            self._changed(group)

    def leave(self, group: str, member: str) -> None:
        g = self._members.get(group, {})
        if member in g:
            del g[member]
            self._changed(group)

    def heartbeat(self, group: str, member: str, now_ms: int) -> None:
        g = self._members.get(group, {})
        if member in g:
            g[member] = now_ms

    def expire(self, now_ms: int) -> list[tuple[str, str]]:
        """Evict members whose heartbeats timed out; returns who was evicted."""
        out = []
        for group, g in self._members.items():
            dead = [
                m for m, hb in g.items() if now_ms - hb > self.session_timeout_ms
            ]
            for m in dead:
                del g[m]
                out.append((group, m))
            if dead:
                self._changed(group)
        return out
