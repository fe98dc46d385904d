"""Heavy-hitter vizketches (§4.3, App. B.2, C.3).

Two algorithms, as in the paper:

* :class:`MisraGriesSketch` — the streaming Misra–Gries algorithm [68]
  with at most K counters; exact pass over all rows, counts
  underestimate truth by at most N/(K+1). Merging follows Agarwal et
  al. [2]: add counters, then subtract the (K+1)-st largest count and
  drop non-positive entries — the merged summary keeps the Misra–Gries
  error guarantee.
* :class:`SamplingHeavyHittersSketch` — sample to target size
  ``n = K² log(K/δ)`` and report items with sample frequency at least
  ``3n/4K``; Thm. 4 shows this returns every item above frequency 1/K
  and nothing below 1/4K, w.h.p. More efficient when K is small.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, require_columns, sample_mask


@dataclass
class CounterMap:
    """Bounded map value -> count (the Misra–Gries state)."""

    counters: dict = field(default_factory=dict)
    rows_scanned: int = 0


class MisraGriesSketch(Sketch[CounterMap]):
    """Streaming heavy hitters with K counters."""

    deterministic = True

    def __init__(self, column: str, k: int = 20):
        if k < 1:
            raise ValueError("k must be positive")
        self.column = column
        self.k = int(k)

    def zero(self) -> CounterMap:
        return CounterMap()

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> CounterMap:
        require_columns(pdf, self.column)
        s = pdf[self.column]
        vals = s[s.notna()].astype(str)
        # Within one leaf we can afford exact value counts on the batch,
        # then reduce to K counters with the MG decrement — equivalent
        # to running MG item-by-item but vectorized.
        vc = vals.value_counts()
        counters = {str(k): int(v) for k, v in vc.items()}
        return CounterMap(
            counters=self._shrink(counters), rows_scanned=len(vals)
        )

    def _shrink(self, counters: dict) -> dict:
        """Reduce to at most K entries via the MG decrement rule."""
        if len(counters) <= self.k:
            return counters
        by_count = sorted(counters.values(), reverse=True)
        dec = by_count[self.k]  # (K+1)-st largest
        return {v: c - dec for v, c in counters.items() if c - dec > 0}

    def merge(self, a: CounterMap, b: CounterMap) -> CounterMap:
        merged = dict(a.counters)
        for v, c in b.counters.items():
            merged[v] = merged.get(v, 0) + c
        return CounterMap(
            counters=self._shrink(merged),
            rows_scanned=a.rows_scanned + b.rows_scanned,
        )

    def heavy_hitters(self, s: CounterMap, threshold: float | None = None) -> list[tuple[str, int]]:
        """Items with (under-)estimated frequency above ``threshold``
        (default 1/(K+1), the MG guarantee), most frequent first."""
        if threshold is None:
            threshold = 1.0 / (self.k + 1)
        cut = threshold * s.rows_scanned
        out = [(v, c) for v, c in s.counters.items() if c >= cut]
        return sorted(out, key=lambda t: (-t[1], t[0]))


def hh_sample_size(k: int, delta: float = 0.01, c: float = 4.0) -> int:
    """Thm. 4's ``n > log(1/(αδ))/α²`` with α = 1/K → ``K² log(K/δ)``."""
    return int(c * k * k * max(1.0, np.log(k / delta)))


class SamplingHeavyHittersSketch(Sketch[CounterMap]):
    """Sampled heavy hitters (App. B.2): cheap when K is small."""

    deterministic = False

    def __init__(
        self,
        column: str,
        k: int = 20,
        total_rows: int = 0,
        delta: float = 0.01,
        c: float = 4.0,
    ):
        self.column = column
        self.k = int(k)
        self.total_rows = int(total_rows)
        self.n_target = hh_sample_size(k, delta, c)
        self.rate = min(1.0, self.n_target / max(1, total_rows))

    def zero(self) -> CounterMap:
        return CounterMap()

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> CounterMap:
        require_columns(pdf, self.column)
        s = pdf[self.column]
        vals = s[s.notna()].astype(str).to_numpy()
        picked = vals[sample_mask(len(vals), self.rate, rng)]
        uniq, cnt = np.unique(picked, return_counts=True)
        return CounterMap(
            counters={str(u): int(c) for u, c in zip(uniq, cnt)},
            rows_scanned=len(picked),  # sample size, the n of Thm. 4
        )

    def merge(self, a: CounterMap, b: CounterMap) -> CounterMap:
        merged = dict(a.counters)
        for v, c in b.counters.items():
            merged[v] = merged.get(v, 0) + c
        return CounterMap(
            counters=merged, rows_scanned=a.rows_scanned + b.rows_scanned
        )

    def heavy_hitters(self, s: CounterMap) -> list[tuple[str, float]]:
        """Items with sample frequency ≥ 3n/4K, as estimated fractions."""
        n = s.rows_scanned
        if n == 0:
            return []
        cut = 3.0 * n / (4.0 * self.k)
        out = [(v, c / n) for v, c in s.counters.items() if c >= cut]
        return sorted(out, key=lambda t: (-t[1], t[0]))
