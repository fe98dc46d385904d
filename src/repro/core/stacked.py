"""Stacked and normalized stacked histogram vizketches (App. B.1).

A stacked histogram over columns X, Y keeps (1) a count per X bucket —
the bar heights — and (2) a count per (X bucket, Y bucket) pair — the
colored subdivisions of each bar. Only ``B_y ≈ 20`` Y buckets are
allowed because the eye cannot distinguish more colors.

The sampled variant bounds both bar-height and subdivision error to
one pixel with sample size ``n = O(V² B_x² log 1/δ)`` (in practice the
display-driven ``CV²`` constant, as with plain histograms). The
*normalized* stacked histogram cannot sample — a near-empty X bucket is
stretched to a full bar, amplifying relative error — so the paper uses
the streaming (exact) variant for it; ``sample=False`` reproduces that.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.buckets import Bucketer
from repro.core.histogram import histogram_sample_size
from repro.core.sketch import Sketch, sample_mask


@dataclass
class StackedCounts:
    """Bar totals (len B_x) plus the B_x × B_y subdivision matrix."""

    bar_counts: np.ndarray
    cell_counts: np.ndarray
    missing: int = 0
    rows_scanned: int = 0
    rows_sampled: int = 0

    def merged_with(self, other: "StackedCounts") -> "StackedCounts":
        return StackedCounts(
            bar_counts=self.bar_counts + other.bar_counts,
            cell_counts=self.cell_counts + other.cell_counts,
            missing=self.missing + other.missing,
            rows_scanned=self.rows_scanned + other.rows_scanned,
            rows_sampled=self.rows_sampled + other.rows_sampled,
        )


class StackedHistogramSketch(Sketch[StackedCounts]):
    """Stacked histogram; ``sample=False`` gives the exact streaming
    variant used for normalized rendering."""

    def __init__(
        self,
        x_column: str,
        y_column: str,
        x_bucketer: Bucketer,
        y_bucketer: Bucketer,
        v_pixels: int = 200,
        total_rows: int = 0,
        delta: float = 0.01,
        c: float = 5.0,
        sample: bool = False,
    ):
        self.x_column = x_column
        self.y_column = y_column
        self.x_bucketer = x_bucketer
        self.y_bucketer = y_bucketer
        self.v_pixels = int(v_pixels)
        self.sample = bool(sample)
        self.n_target = histogram_sample_size(v_pixels, delta, c)
        self.rate = (
            min(1.0, self.n_target / max(1, total_rows)) if sample else 1.0
        )
        self.deterministic = not sample or self.rate >= 1.0

    def cache_key(self) -> str:
        return (
            f"Stacked({self.x_column},{self.y_column},"
            f"{self.x_bucketer.labels()},{self.y_bucketer.labels()},"
            f"sample={self.sample},rate={self.rate})"
        )

    def zero(self) -> StackedCounts:
        bx, by = self.x_bucketer.n, self.y_bucketer.n
        return StackedCounts(
            bar_counts=np.zeros(bx, dtype=np.int64),
            cell_counts=np.zeros((bx, by), dtype=np.int64),
        )

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> StackedCounts:
        bx, by = self.x_bucketer.n, self.y_bucketer.n
        # Bucket both columns on the full frame so the row alignment of
        # X and Y indices is preserved; a row counts only if both
        # columns are present and in range.
        keep = pdf[[self.x_column, self.y_column]].notna().all(axis=1)
        sub = pdf[keep]
        missing = len(pdf) - len(sub)
        if self.rate < 1.0:
            sub = sub[sample_mask(len(sub), self.rate, rng)]
        n_sampled = len(sub)  # before bucket filtering, for unbiased scaling
        xi, _ = self.x_bucketer.index(sub, self.x_column)
        yi, _ = self.y_bucketer.index(sub, self.y_column)
        ok = (xi >= 0) & (yi >= 0)
        xi, yi = xi[ok], yi[ok]
        flat = np.bincount(xi * by + yi, minlength=bx * by).astype(np.int64)
        cells = flat.reshape(bx, by)
        return StackedCounts(
            bar_counts=cells.sum(axis=1),
            cell_counts=cells,
            missing=missing,
            rows_scanned=int(keep.sum()),
            rows_sampled=n_sampled,
        )

    def merge(self, a: StackedCounts, b: StackedCounts) -> StackedCounts:
        return a.merged_with(b)

    def render(self, s: StackedCounts, normalized: bool = False) -> np.ndarray:
        """Pixel heights of each subdivision, per bar.

        Un-normalized: bars scaled so the tallest is ``v_pixels`` high.
        Normalized: every non-empty bar is exactly ``v_pixels`` high and
        subdivisions show within-bar fractions (App. B.1).
        """
        cells = s.cell_counts.astype("float64")
        bars = s.bar_counts.astype("float64")
        out = np.zeros_like(cells)
        if normalized:
            nz = bars > 0
            out[nz] = cells[nz] / bars[nz, None] * self.v_pixels
        else:
            top = bars.max()
            if top > 0:
                out = cells / top * self.v_pixels
        return np.rint(out).astype(np.int64)
