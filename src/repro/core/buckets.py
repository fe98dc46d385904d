"""Bucketing strategies shared by the 2-D vizketches.

The paper's stacked histograms, heat maps and trellis plots bucket each
axis either by equi-width numeric intervals (§4.3), by one-bucket-per-
distinct-value for low-cardinality categorical data, or by alphabetical
string ranges from the bottom-k quantile sketch (App. B.1). A
``Bucketer`` maps a column of values to bucket ids ``0..n-1`` (or -1
for out-of-range / unknown), so the sketches themselves stay agnostic
of the data type — the same separation Hillview uses.
"""
from __future__ import annotations

from abc import ABC, abstractmethod

import numpy as np
import pandas as pd

from repro.core.histogram import bucket_indices
from repro.core.sketch import numeric_values


class Bucketer(ABC):
    """Maps column values to bucket indices; ``n`` is the bucket count."""

    n: int

    @abstractmethod
    def index(self, pdf: pd.DataFrame, column: str) -> tuple[np.ndarray, int]:
        """Return (bucket ids for non-missing rows, number of missing rows)."""

    @abstractmethod
    def labels(self) -> list[str]:
        """Human-readable bucket labels, used by renderers and tests."""


class NumericBucketer(Bucketer):
    """Equi-width intervals over ``[x0, x1]`` (last bucket right-closed)."""

    def __init__(self, x0: float, x1: float, n: int):
        self.x0 = float(x0)
        self.x1 = float(x1)
        self.n = int(n)

    def index(self, pdf: pd.DataFrame, column: str) -> tuple[np.ndarray, int]:
        vals = numeric_values(pdf, column)
        missing = len(pdf) - len(vals)
        return bucket_indices(vals, self.x0, self.x1, self.n), missing

    def labels(self) -> list[str]:
        edges = np.linspace(self.x0, self.x1, self.n + 1)
        return [f"[{edges[i]:g},{edges[i+1]:g})" for i in range(self.n)]


class CategoricalBucketer(Bucketer):
    """One bucket per distinct value (used when distinct count <= 50)."""

    def __init__(self, values: list):
        self.values = list(values)
        self.n = len(self.values)
        self._pos = {v: i for i, v in enumerate(self.values)}

    def index(self, pdf: pd.DataFrame, column: str) -> tuple[np.ndarray, int]:
        s = pdf[column]
        nonnull = s[s.notna()]
        missing = len(pdf) - len(nonnull)
        idx = nonnull.map(self._pos).fillna(-1).to_numpy(dtype=np.int64)
        return idx, missing

    def labels(self) -> list[str]:
        return [str(v) for v in self.values]


class StringRangeBucketer(Bucketer):
    """Alphabetical ranges: bucket i is ``[boundaries[i], boundaries[i+1])``.

    Boundaries come from the bottom-k distinct-quantile sketch
    (:mod:`repro.core.bottomk`); the last bucket is unbounded above.
    """

    def __init__(self, boundaries: list[str]):
        if not boundaries:
            raise ValueError("need at least one boundary")
        self.boundaries = list(boundaries)
        self.n = len(self.boundaries)
        self._arr = np.array(self.boundaries)

    def index(self, pdf: pd.DataFrame, column: str) -> tuple[np.ndarray, int]:
        s = pdf[column]
        nonnull = s[s.notna()].astype(str).to_numpy()
        missing = len(pdf) - len(nonnull)
        idx = np.searchsorted(self._arr, nonnull, side="right") - 1
        return idx.astype(np.int64), missing

    def labels(self) -> list[str]:
        ends = self.boundaries[1:] + ["…"]
        return [f"[{a},{b})" for a, b in zip(self.boundaries, ends)]
