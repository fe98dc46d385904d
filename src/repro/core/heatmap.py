"""Heat map and trellis-plot vizketches (§4.3, App. B.1).

A heat map bins two columns into ``B_x × B_y`` cells of ``b×b`` pixels
(b = 3) and colors each cell by density on a ``c ≈ 20``-shade scale.
With a *linear* color scale the required per-cell accuracy is one half
color shade, reachable by sampling with a display-driven target size;
with a *log* color scale small densities need multiplicative accuracy,
so the sketch must stream the full data (App. C.2) — ``sample=False``.

A trellis plot is an array of k inner plots split by a grouping
column; because the total rendering area is fixed, the inner plots
shrink as k grows, and the summary stays the size of a single plot of
the full display (App. B.1). We implement the heat-map trellis the
paper shows in Fig. 13.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.buckets import Bucketer
from repro.core.sketch import Sketch, sample_mask


def heatmap_sample_size(
    colors: int, b_x: int, b_y: int, delta: float = 0.01, c: float = 1.0
) -> int:
    """Display-driven target sample size ``n = O(c² B_x² B_y² log 1/δ)``.

    As with histograms, App. C.2 notes the worst-case bound (p_max as
    small as 1/(B_x·B_y)) is loose in practice; the implementation uses
    the practical constant-scaled form ``C·colors²·(B_x+B_y)²·ln(1/δ)``
    which keeps cells within one shade on realistic densities while
    staying independent of the dataset size.
    """
    return int(
        c * colors * colors * (b_x + b_y) ** 2 * max(1.0, np.log(1.0 / delta))
    )


@dataclass
class HeatmapCounts:
    """Summary: B_x × B_y matrix of cell counts."""

    cells: np.ndarray
    missing: int = 0
    rows_scanned: int = 0
    rows_sampled: int = 0

    def merged_with(self, other: "HeatmapCounts") -> "HeatmapCounts":
        return HeatmapCounts(
            cells=self.cells + other.cells,
            missing=self.missing + other.missing,
            rows_scanned=self.rows_scanned + other.rows_scanned,
            rows_sampled=self.rows_sampled + other.rows_sampled,
        )


class HeatmapSketch(Sketch[HeatmapCounts]):
    """Two-dimensional density grid; ``merge`` adds matrices (§4.3)."""

    def __init__(
        self,
        x_column: str,
        y_column: str,
        x_bucketer: Bucketer,
        y_bucketer: Bucketer,
        colors: int = 20,
        total_rows: int = 0,
        delta: float = 0.01,
        sample: bool = False,
    ):
        self.x_column = x_column
        self.y_column = y_column
        self.x_bucketer = x_bucketer
        self.y_bucketer = y_bucketer
        self.colors = int(colors)
        self.sample = bool(sample)
        self.n_target = heatmap_sample_size(
            colors, x_bucketer.n, y_bucketer.n, delta
        )
        self.rate = (
            min(1.0, self.n_target / max(1, total_rows)) if sample else 1.0
        )
        self.deterministic = not sample or self.rate >= 1.0

    def cache_key(self) -> str:
        return (
            f"Heatmap({self.x_column},{self.y_column},"
            f"{self.x_bucketer.labels()},{self.y_bucketer.labels()},"
            f"rate={self.rate})"
        )

    def zero(self) -> HeatmapCounts:
        return HeatmapCounts(
            np.zeros((self.x_bucketer.n, self.y_bucketer.n), dtype=np.int64)
        )

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> HeatmapCounts:
        bx, by = self.x_bucketer.n, self.y_bucketer.n
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
        return HeatmapCounts(
            cells=flat.reshape(bx, by),
            missing=missing,
            rows_scanned=int(keep.sum()),
            rows_sampled=n_sampled,
        )

    def merge(self, a: HeatmapCounts, b: HeatmapCounts) -> HeatmapCounts:
        return a.merged_with(b)

    def render(self, s: HeatmapCounts) -> np.ndarray:
        """Color index 0..colors-1 per cell on a linear density scale.

        0 is reserved for exactly-empty cells (the paper notes the jump
        from background to the first shade matters perceptually).
        """
        cells = s.cells.astype("float64")
        top = cells.max()
        out = np.zeros_like(cells, dtype=np.int64)
        if top > 0:
            nz = cells > 0
            out[nz] = np.ceil(cells[nz] / top * (self.colors - 1)).astype(np.int64)
        return out


@dataclass
class TrellisCounts:
    """Summary: k inner heat maps stacked along axis 0."""

    groups: np.ndarray  # shape (k, B_x, B_y)
    missing: int = 0
    rows_scanned: int = 0
    rows_sampled: int = 0

    def merged_with(self, other: "TrellisCounts") -> "TrellisCounts":
        return TrellisCounts(
            groups=self.groups + other.groups,
            missing=self.missing + other.missing,
            rows_scanned=self.rows_scanned + other.rows_scanned,
            rows_sampled=self.rows_sampled + other.rows_sampled,
        )


class HeatmapTrellisSketch(Sketch[TrellisCounts]):
    """A 1-D trellis of heat maps split by ``w_column`` (App. B.1).

    The grouping axis uses a bucketer too (typically categorical over
    the k chosen values ``w_1..w_k``). Total bin count is the same as a
    single heat map of the full display, because each inner plot's
    resolution shrinks by the trellis layout.
    """

    def __init__(
        self,
        w_column: str,
        x_column: str,
        y_column: str,
        w_bucketer: Bucketer,
        x_bucketer: Bucketer,
        y_bucketer: Bucketer,
        colors: int = 20,
        total_rows: int = 0,
        delta: float = 0.01,
        sample: bool = False,
    ):
        self.w_column = w_column
        self.x_column = x_column
        self.y_column = y_column
        self.w_bucketer = w_bucketer
        self.x_bucketer = x_bucketer
        self.y_bucketer = y_bucketer
        self.colors = int(colors)
        self.sample = bool(sample)
        self.n_target = heatmap_sample_size(colors, x_bucketer.n, y_bucketer.n, delta)
        self.rate = (
            min(1.0, self.n_target / max(1, total_rows)) if sample else 1.0
        )
        self.deterministic = not sample or self.rate >= 1.0

    def cache_key(self) -> str:
        return (
            f"Trellis({self.w_column},{self.x_column},{self.y_column},"
            f"{self.w_bucketer.labels()},{self.x_bucketer.labels()},"
            f"{self.y_bucketer.labels()},rate={self.rate})"
        )

    def zero(self) -> TrellisCounts:
        return TrellisCounts(
            np.zeros(
                (self.w_bucketer.n, self.x_bucketer.n, self.y_bucketer.n),
                dtype=np.int64,
            )
        )

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> TrellisCounts:
        k, bx, by = self.w_bucketer.n, self.x_bucketer.n, self.y_bucketer.n
        cols = [self.w_column, self.x_column, self.y_column]
        keep = pdf[cols].notna().all(axis=1)
        sub = pdf[keep]
        missing = len(pdf) - len(sub)
        if self.rate < 1.0:
            sub = sub[sample_mask(len(sub), self.rate, rng)]
        n_sampled = len(sub)  # before bucket filtering, for unbiased scaling
        wi, _ = self.w_bucketer.index(sub, self.w_column)
        xi, _ = self.x_bucketer.index(sub, self.x_column)
        yi, _ = self.y_bucketer.index(sub, self.y_column)
        ok = (wi >= 0) & (xi >= 0) & (yi >= 0)
        wi, xi, yi = wi[ok], xi[ok], yi[ok]
        flat = np.bincount(
            (wi * bx + xi) * by + yi, minlength=k * bx * by
        ).astype(np.int64)
        return TrellisCounts(
            groups=flat.reshape(k, bx, by),
            missing=missing,
            rows_scanned=int(keep.sum()),
            rows_sampled=n_sampled,
        )

    def merge(self, a: TrellisCounts, b: TrellisCounts) -> TrellisCounts:
        return a.merged_with(b)
