"""Bottom-k sketch over distinct values (App. B.1; refs [92, 19]).

Keeps the k distinct strings with the smallest values of a fixed hash
function. Because the hash order is a uniformly random permutation of
the distinct values, the sorted bottom-k sample estimates quantiles
*over distinct values* — exactly what Hillview needs to find
alphabetical bucket boundaries for string histograms without sorting
the dataset. Duplicate occurrences do not change the sketch, so the
estimate is per-distinct-value, not frequency weighted.

The hash is a seeded blake2b prefix (not Python's ``hash``, which is
process-randomized and would break deterministic replay, §5.8).
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, require_columns


def stable_hash64(value: str, seed: int = 0) -> int:
    """Deterministic 64-bit hash of a string, independent of process."""
    h = hashlib.blake2b(
        value.encode("utf-8"), digest_size=8, salt=seed.to_bytes(8, "little")
    )
    return int.from_bytes(h.digest(), "little")


@dataclass
class BottomK:
    """The k (hash, value) pairs with smallest hash seen so far."""

    k: int
    entries: dict[str, int] = field(default_factory=dict)  # value -> hash
    distinct_seen: int = 0  # distinct values this leaf contributed (pre-trim)

    def values_by_hash(self) -> list[str]:
        return [v for v, _ in sorted(self.entries.items(), key=lambda kv: kv[1])]


class BottomKSketch(Sketch[BottomK]):
    """Mergeable bottom-k sample of a string column's distinct values."""

    deterministic = True  # hash-based: no RNG, replays identically

    def __init__(self, column: str, k: int = 500, hash_seed: int = 0):
        self.column = column
        self.k = int(k)
        self.hash_seed = int(hash_seed)

    def zero(self) -> BottomK:
        return BottomK(k=self.k)

    def _trim(self, entries: dict[str, int]) -> dict[str, int]:
        if len(entries) <= self.k:
            return entries
        keep = sorted(entries.items(), key=lambda kv: kv[1])[: self.k]
        return dict(keep)

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> BottomK:
        require_columns(pdf, self.column)
        s = pdf[self.column]
        uniq = s[s.notna()].astype(str).unique()
        entries = {v: stable_hash64(v, self.hash_seed) for v in uniq}
        return BottomK(
            k=self.k, entries=self._trim(entries), distinct_seen=len(uniq)
        )

    def merge(self, a: BottomK, b: BottomK) -> BottomK:
        merged = dict(a.entries)
        merged.update(b.entries)  # same value hashes identically
        return BottomK(
            k=self.k,
            entries=self._trim(merged),
            distinct_seen=a.distinct_seen + b.distinct_seen,
        )


def string_bucket_boundaries(sample: BottomK, max_buckets: int = 50) -> list[str]:
    """Alphabetical bucket left-edges from a bottom-k sample (App. B.1).

    If the sample holds at most ``max_buckets`` distinct values (and was
    never trimmed, i.e. it is the exact distinct set), each value gets
    its own bucket. Otherwise pick ``max_buckets`` approximate distinct
    quantiles at 1/max_buckets, 2/max_buckets, … from the alphabetically
    sorted sample.
    """
    values = sorted(sample.entries.keys())
    if not values:
        return [""]
    if len(values) <= max_buckets:
        return values
    idx = np.unique(
        (np.arange(max_buckets) * len(values) / max_buckets).astype(int)
    )
    return [values[i] for i in idx]
