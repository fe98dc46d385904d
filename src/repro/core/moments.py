"""Moments / Range sketch (App. B.3) — the universal prepare phase.

Collects a column's min, max, row count, missing count, and power sums
up to order K (mean and variance derive from the first two). This is
the sketch behind the first execution tree of every chart (§5.3): the
range determines bucket boundaries and the row count determines
sampling rates. It is deterministic, so the computation cache reuses it
across visualizations (§5.4).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, numeric_values, require_columns


@dataclass
class Moments:
    count: int = 0  # non-missing rows
    missing: int = 0
    min: float = np.inf
    max: float = -np.inf
    power_sums: np.ndarray = field(default_factory=lambda: np.zeros(2))

    @property
    def total_rows(self) -> int:
        return self.count + self.missing

    @property
    def mean(self) -> float:
        return self.power_sums[0] / self.count if self.count else float("nan")

    @property
    def variance(self) -> float:
        if self.count < 2 or len(self.power_sums) < 2:
            return float("nan")
        m = self.mean
        return self.power_sums[1] / self.count - m * m


class MomentsSketch(Sketch[Moments]):
    """Exact column statistics via one streaming pass."""

    deterministic = True

    def __init__(self, column: str, k_moments: int = 2):
        if k_moments < 1:
            raise ValueError("need at least the first moment")
        self.column = column
        self.k_moments = int(k_moments)

    def zero(self) -> Moments:
        return Moments(power_sums=np.zeros(self.k_moments))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> Moments:
        require_columns(pdf, self.column)
        vals = numeric_values(pdf, self.column)
        missing = len(pdf) - len(vals)
        sums = np.array(
            [np.sum(vals**p) for p in range(1, self.k_moments + 1)]
        )
        return Moments(
            count=len(vals),
            missing=missing,
            min=float(vals.min()) if len(vals) else np.inf,
            max=float(vals.max()) if len(vals) else -np.inf,
            power_sums=sums,
        )

    def merge(self, a: Moments, b: Moments) -> Moments:
        return Moments(
            count=a.count + b.count,
            missing=a.missing + b.missing,
            min=min(a.min, b.min),
            max=max(a.max, b.max),
            power_sums=a.power_sums + b.power_sums,
        )


@dataclass
class RowCount:
    rows: int = 0


class CountSketch(Sketch[RowCount]):
    """Total row count of a (possibly filtered) table — the cheapest
    prepare-phase sketch, used when no column range is needed."""

    deterministic = True

    def __init__(self):
        pass

    def zero(self) -> RowCount:
        return RowCount()

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> RowCount:
        return RowCount(rows=len(pdf))

    def merge(self, a: RowCount, b: RowCount) -> RowCount:
        return RowCount(rows=a.rows + b.rows)
