"""Histogram and CDF vizketches (paper §4.3, Appendix B.1, C.2).

Three flavours, exactly as in the paper:

* :class:`HistogramStreamingSketch` — exact bucket counts via one full
  scan; no error ("precise to the last digit").
* :class:`HistogramSamplingSketch` — each leaf Bernoulli-samples at a
  global rate chosen so the rendered bar heights are within half a
  pixel of the ideal histogram with probability ``1 - delta``
  (Thm. 3). The target sample size depends only on the display
  (``CV²`` in practice, App. C.2), never on the dataset size — the
  source of the super-linear scalability in Fig. 7/8.
* :class:`CDFSketch` — one bin per horizontal pixel, sampled with
  target size ``O(V² log(1/δ))`` (App. C.2), rendered as a cumulative
  sum rounded to the nearest vertical pixel.

String columns reuse the same machinery through explicit bucket
boundaries produced by the bottom-k quantile sketch
(:mod:`repro.core.bottomk`), via :class:`StringHistogramSketch`.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.sketch import (
    Sketch,
    numeric_values,
    require_columns,
    sample_mask,
)


@dataclass
class BinCounts:
    """Summary for all 1-D bucketed vizketches: a vector of bin counts.

    ``rows_scanned`` is the number of (non-missing) rows the leaf saw;
    ``rows_sampled`` how many landed in the sample (== scanned for
    streaming sketches). The ratio estimates the effective sampling
    rate at render time, which is how merged summaries from leaves with
    different sizes stay unbiased.
    """

    counts: np.ndarray
    missing: int = 0
    rows_scanned: int = 0
    rows_sampled: int = 0

    def merged_with(self, other: "BinCounts") -> "BinCounts":
        return BinCounts(
            counts=self.counts + other.counts,
            missing=self.missing + other.missing,
            rows_scanned=self.rows_scanned + other.rows_scanned,
            rows_sampled=self.rows_sampled + other.rows_sampled,
        )


def bucket_indices(vals: np.ndarray, x0: float, x1: float, buckets: int) -> np.ndarray:
    """Map values in ``[x0, x1]`` to bucket ids ``0..buckets-1``.

    Buckets are half-open equi-width intervals except the last, which
    also includes ``x1`` (the range comes from the Moments prepare
    phase, so the max value must land in the last bucket, not fall out).
    Out-of-range values return -1 and are dropped by callers — they can
    occur when a histogram is recomputed after a zoom (§3.4).
    """
    if x1 <= x0:
        # Degenerate range (constant column): everything in bucket 0.
        return np.where((vals >= x0) & (vals <= x1), 0, -1)
    idx = np.floor((vals - x0) / (x1 - x0) * buckets).astype(np.int64)
    # Float rounding can misplace values sitting exactly on a bucket
    # edge by one bucket in either direction (e.g. (19+10)/100*100 =
    # 28.999...96). Correct against the canonical linspace edges — the
    # same convention np.histogram uses — then clamp in-range values.
    idx = np.clip(idx, 0, buckets - 1)
    edges = np.linspace(x0, x1, buckets + 1)
    idx[vals < edges[idx]] -= 1
    bump = (vals >= edges[np.minimum(idx + 1, buckets)]) & (idx < buckets - 1)
    idx[bump] += 1
    idx = np.clip(idx, 0, buckets - 1)
    idx[(vals < x0) | (vals > x1)] = -1
    return idx


def _tally(idx: np.ndarray, buckets: int) -> np.ndarray:
    valid = idx[idx >= 0]
    return np.bincount(valid, minlength=buckets).astype(np.int64)


class HistogramStreamingSketch(Sketch[BinCounts]):
    """Exact histogram: scan every row, count per bucket (App. B.1)."""

    deterministic = True

    def __init__(self, column: str, x0: float, x1: float, buckets: int):
        self.column = column
        self.x0 = float(x0)
        self.x1 = float(x1)
        self.buckets = int(buckets)

    def zero(self) -> BinCounts:
        return BinCounts(np.zeros(self.buckets, dtype=np.int64))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> BinCounts:
        require_columns(pdf, self.column)
        vals = numeric_values(pdf, self.column)
        missing = len(pdf) - len(vals)
        idx = bucket_indices(vals, self.x0, self.x1, self.buckets)
        return BinCounts(
            counts=_tally(idx, self.buckets),
            missing=missing,
            rows_scanned=len(vals),
            rows_sampled=len(vals),
        )

    def merge(self, a: BinCounts, b: BinCounts) -> BinCounts:
        return a.merged_with(b)


def histogram_sample_size(
    v_pixels: int, delta: float = 0.01, c: float = 5.0
) -> int:
    """Display-driven target sample size for histograms/CDFs.

    Theorem 3 gives ``O(V²/(μ p_max)² log(1/δ))``; Appendix C.2 notes
    that in practice ``CV²`` samples for a constant ``C`` work well.
    We use ``C·V²·ln(1/δ)`` — independent of the dataset size, which is
    the whole point of a vizketch.
    """
    return int(c * v_pixels * v_pixels * max(1.0, np.log(1.0 / delta)))


class HistogramSamplingSketch(Sketch[BinCounts]):
    """Approximate histogram with a per-pixel error guarantee (Thm. 3).

    ``total_rows`` comes from the prepare-phase Moments sketch; the
    per-leaf Bernoulli rate is ``n_target / total_rows`` so the union of
    leaf samples has expected size ``n_target`` regardless of sharding.
    """

    deterministic = False

    def __init__(
        self,
        column: str,
        x0: float,
        x1: float,
        buckets: int,
        v_pixels: int,
        total_rows: int,
        delta: float = 0.01,
        c: float = 5.0,
    ):
        self.column = column
        self.x0 = float(x0)
        self.x1 = float(x1)
        self.buckets = int(buckets)
        self.v_pixels = int(v_pixels)
        self.total_rows = int(total_rows)
        self.delta = float(delta)
        self.n_target = histogram_sample_size(v_pixels, delta, c)
        self.rate = min(1.0, self.n_target / max(1, total_rows))

    def zero(self) -> BinCounts:
        return BinCounts(np.zeros(self.buckets, dtype=np.int64))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> BinCounts:
        require_columns(pdf, self.column)
        vals = numeric_values(pdf, self.column)
        missing = len(pdf) - len(vals)
        picked = vals[sample_mask(len(vals), self.rate, rng)]
        idx = bucket_indices(picked, self.x0, self.x1, self.buckets)
        return BinCounts(
            counts=_tally(idx, self.buckets),
            missing=missing,
            rows_scanned=len(vals),
            rows_sampled=len(picked),
        )

    def merge(self, a: BinCounts, b: BinCounts) -> BinCounts:
        return a.merged_with(b)

    def estimate_counts(self, s: BinCounts) -> np.ndarray:
        """Unbiased estimate of true bucket counts from sampled counts."""
        if s.rows_sampled == 0 or s.rows_scanned == 0:
            return s.counts.astype("float64")
        scale = s.rows_scanned / s.rows_sampled
        return s.counts * scale


def render_histogram(s: BinCounts, v_pixels: int) -> np.ndarray:
    """Bar heights in pixels: largest bar scaled to ``v_pixels`` (§4.3)."""
    counts = s.counts.astype("float64")
    top = counts.max()
    if top <= 0:
        return np.zeros_like(counts, dtype=np.int64)
    return np.rint(counts / top * v_pixels).astype(np.int64)


class CDFSketch(Sketch[BinCounts]):
    """CDF vizketch: one bin per horizontal pixel (App. B.1).

    Rendered value for pixel ``h`` is the cumulative fraction of rows
    at or below the right edge of interval ``I_h``, rounded to the
    nearest of ``V`` vertical pixels; sampling keeps each pixel within
    ±0.6/V of truth w.h.p. (App. C.2 sets ``n = O(V² log 1/δ)``).
    """

    deterministic = False

    def __init__(
        self,
        column: str,
        x0: float,
        x1: float,
        h_pixels: int,
        v_pixels: int,
        total_rows: int,
        delta: float = 0.01,
        c: float = 5.0,
        sample: bool = True,
    ):
        self.column = column
        self.x0 = float(x0)
        self.x1 = float(x1)
        self.h_pixels = int(h_pixels)
        self.v_pixels = int(v_pixels)
        self.total_rows = int(total_rows)
        self.delta = float(delta)
        self.sample = bool(sample)
        self.n_target = histogram_sample_size(v_pixels, delta, c)
        self.rate = (
            min(1.0, self.n_target / max(1, total_rows)) if sample else 1.0
        )
        self.deterministic = not sample or self.rate >= 1.0

    def zero(self) -> BinCounts:
        return BinCounts(np.zeros(self.h_pixels, dtype=np.int64))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> BinCounts:
        require_columns(pdf, self.column)
        vals = numeric_values(pdf, self.column)
        missing = len(pdf) - len(vals)
        picked = vals[sample_mask(len(vals), self.rate, rng)]
        idx = bucket_indices(picked, self.x0, self.x1, self.h_pixels)
        return BinCounts(
            counts=_tally(idx, self.h_pixels),
            missing=missing,
            rows_scanned=len(vals),
            rows_sampled=len(picked),
        )

    def merge(self, a: BinCounts, b: BinCounts) -> BinCounts:
        return a.merged_with(b)

    def render(self, s: BinCounts) -> np.ndarray:
        """Per-horizontal-pixel CDF value in vertical pixels 0..V."""
        if s.rows_sampled == 0:
            return np.zeros(self.h_pixels, dtype=np.int64)
        frac = np.cumsum(s.counts) / s.rows_sampled
        return np.rint(frac * self.v_pixels).astype(np.int64)


class StringHistogramSketch(Sketch[BinCounts]):
    """Histogram over string data with explicit bucket boundaries.

    ``boundaries`` are the left edges of up-to-50 alphabetical buckets
    (App. B.1 "Equi-width buckets for string data"), produced by the
    bottom-k quantile sketch in the prepare phase. Bucket ``i`` holds
    strings in ``[boundaries[i], boundaries[i+1])``; the last bucket is
    unbounded above. Strings below ``boundaries[0]`` are dropped (they
    cannot occur when boundaries come from the data's own range).
    """

    deterministic = True

    def __init__(self, column: str, boundaries: list[str]):
        if not boundaries:
            raise ValueError("need at least one bucket boundary")
        self.column = column
        self.boundaries = list(boundaries)

    def zero(self) -> BinCounts:
        return BinCounts(np.zeros(len(self.boundaries), dtype=np.int64))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> BinCounts:
        require_columns(pdf, self.column)
        s = pdf[self.column]
        vals = s[s.notna()].astype(str).to_numpy()
        missing = len(pdf) - len(vals)
        # searchsorted('right') - 1 gives the bucket whose left edge is
        # the greatest boundary <= value.
        idx = np.searchsorted(np.array(self.boundaries), vals, side="right") - 1
        return BinCounts(
            counts=_tally(idx, len(self.boundaries)),
            missing=missing,
            rows_scanned=len(vals),
            rows_sampled=len(vals),
        )

    def merge(self, a: BinCounts, b: BinCounts) -> BinCounts:
        return a.merged_with(b)
