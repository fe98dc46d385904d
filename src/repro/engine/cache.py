"""Computation cache (paper §5.4).

Stores the summaries produced by deterministic mergeable summaries,
indexed by (table version, sketch cache key). Summaries are small by
construction, so a large number fits in memory. Randomized (sampling)
vizketches are only cached together with their seed — the redo log
stores seeds for replay determinism (§5.8), and a cached randomized
result keyed by seed replays bit-identically.

Entries carry a last-access time and can be purged (the paper purges
after 2 hours; tests exercise the purge with injected clocks). The
cache is *soft state*: dropping it is always safe, queries just
recompute (§5.7).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Any


@dataclass
class CacheStats:
    hits: int = 0
    misses: int = 0
    evictions: int = 0


class ComputationCache:
    """Soft-state summary cache keyed by (table version, sketch key, seed)."""

    def __init__(self, ttl_seconds: float = 7200.0, clock=time.monotonic):
        self.ttl = float(ttl_seconds)
        self._clock = clock
        self._entries: dict[tuple, tuple[float, Any]] = {}
        self.stats = CacheStats()

    @staticmethod
    def key(table_version: str, sketch_key: str, seed: int | None) -> tuple:
        return (table_version, sketch_key, seed)

    def get(self, key: tuple) -> Any | None:
        self._purge()
        hit = self._entries.get(key)
        if hit is None:
            self.stats.misses += 1
            return None
        self.stats.hits += 1
        self._entries[key] = (self._clock(), hit[1])  # refresh recency
        return hit[1]

    def put(self, key: tuple, value: Any) -> None:
        self._entries[key] = (self._clock(), value)

    def _purge(self) -> None:
        now = self._clock()
        dead = [k for k, (t, _) in self._entries.items() if now - t > self.ttl]
        for k in dead:
            del self._entries[k]
            self.stats.evictions += 1

    def clear(self) -> None:
        """Simulate losing the soft state (worker restart, GC)."""
        self._entries.clear()

    def __len__(self) -> int:
        return len(self._entries)
