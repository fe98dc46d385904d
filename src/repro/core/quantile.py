"""Quantile vizketch for the scroll bar (App. B.2, C.1).

Moving the scroll bar to pixel ``j`` of ``V`` asks for the row at
relative rank ``j/V`` of the current sort order, to within ``±1/2V``
(Thm. 2: a sample of ``O(V² log 1/δ)`` uniformly random rows suffices,
with ε = 1/2V). The summary is simply the union of the leaves' Bernoulli
samples of the sort key — bounded by the display-driven target size, so
it is a legal vizketch summary. ``quantile(q)`` then returns the sample
element with relative rank closest to ``q``, which becomes the new top
row of the tabular view.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, numeric_values, sample_mask


def quantile_sample_size(v_pixels: int, delta: float = 0.01, c: float = 2.0) -> int:
    """Thm. 2 with ε = 1/2V: ``n = O(ε⁻² log 1/δ) = O(V² log 1/δ)``."""
    return int(c * v_pixels * v_pixels * max(1.0, np.log(1.0 / delta)))


@dataclass
class QuantileSample:
    """Uniform sample of the sort-key column (values kept sorted)."""

    values: np.ndarray = field(default_factory=lambda: np.empty(0))
    rows_scanned: int = 0


class QuantileSketch(Sketch[QuantileSample]):
    """Uniform row sample sized for scroll-bar accuracy."""

    deterministic = False

    def __init__(
        self,
        column: str,
        v_pixels: int,
        total_rows: int,
        delta: float = 0.01,
        c: float = 2.0,
    ):
        self.column = column
        self.v_pixels = int(v_pixels)
        self.total_rows = int(total_rows)
        self.n_target = quantile_sample_size(v_pixels, delta, c)
        self.rate = min(1.0, self.n_target / max(1, total_rows))

    def zero(self) -> QuantileSample:
        return QuantileSample()

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> QuantileSample:
        vals = numeric_values(pdf, self.column)
        picked = vals[sample_mask(len(vals), self.rate, rng)]
        return QuantileSample(values=np.sort(picked), rows_scanned=len(vals))

    def merge(self, a: QuantileSample, b: QuantileSample) -> QuantileSample:
        return QuantileSample(
            values=np.sort(np.concatenate([a.values, b.values])),
            rows_scanned=a.rows_scanned + b.rows_scanned,
        )

    def quantile(self, s: QuantileSample, q: float) -> float:
        """Sample element whose relative rank is closest to ``q``∈[0,1]."""
        if len(s.values) == 0:
            raise ValueError("empty sample: no rows scanned or rate too low")
        i = int(round(q * (len(s.values) - 1)))
        return float(s.values[np.clip(i, 0, len(s.values) - 1)])
