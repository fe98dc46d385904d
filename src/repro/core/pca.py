"""PCA via a sampled correlation-matrix sketch (§3.3, App. B.3).

The M×M correlation matrix is a function of per-column sums, per-column
sums of squares, and pairwise product sums — all additive, so a sketch
that accumulates them (optionally over a sample) is mergeable. The
principal components are the top-K eigenvectors of the correlation
matrix, computed at the root from the tiny M×M summary; projecting the
data onto them is a user-defined map column (§5.6).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, require_columns, sample_mask


@dataclass
class CrossMoments:
    """n, per-column sums, and the X^T X Gram matrix over sampled rows."""

    n: int
    sums: np.ndarray  # (M,)
    gram: np.ndarray  # (M, M)

    def merged_with(self, other: "CrossMoments") -> "CrossMoments":
        return CrossMoments(
            n=self.n + other.n,
            sums=self.sums + other.sums,
            gram=self.gram + other.gram,
        )


def pca_sample_size(m_cols: int, delta: float = 0.01, c: float = 20000.0) -> int:
    """Enough rows that each of the O(M²) correlation entries is tight;
    independent of the dataset size like every vizketch target."""
    return int(c * max(1, m_cols) * max(1.0, np.log(1.0 / delta)))


class CorrelationSketch(Sketch[CrossMoments]):
    """Accumulates sampled cross-moments of M numeric columns."""

    deterministic = False

    def __init__(
        self,
        columns: list[str],
        total_rows: int = 0,
        delta: float = 0.01,
        sample: bool = True,
    ):
        if not columns:
            raise ValueError("need at least one column")
        self.columns = list(columns)
        self.sample = bool(sample)
        self.n_target = pca_sample_size(len(columns), delta)
        self.rate = (
            min(1.0, self.n_target / max(1, total_rows)) if sample else 1.0
        )
        self.deterministic = not sample or self.rate >= 1.0

    def zero(self) -> CrossMoments:
        m = len(self.columns)
        return CrossMoments(n=0, sums=np.zeros(m), gram=np.zeros((m, m)))

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> CrossMoments:
        require_columns(pdf, *self.columns)
        x = (
            pdf[self.columns]
            .apply(pd.to_numeric, errors="coerce")
            .dropna()
            .to_numpy(dtype="float64")
        )
        if self.rate < 1.0:
            x = x[sample_mask(len(x), self.rate, rng)]
        if len(x) == 0:
            return self.zero()
        return CrossMoments(n=len(x), sums=x.sum(axis=0), gram=x.T @ x)

    def merge(self, a: CrossMoments, b: CrossMoments) -> CrossMoments:
        return a.merged_with(b)

    def correlation_matrix(self, s: CrossMoments) -> np.ndarray:
        if s.n < 2:
            raise ValueError("need at least 2 sampled rows")
        mean = s.sums / s.n
        cov = s.gram / s.n - np.outer(mean, mean)
        sd = np.sqrt(np.clip(np.diag(cov), 1e-30, None))
        return cov / np.outer(sd, sd)

    def principal_components(self, s: CrossMoments, k: int) -> tuple[np.ndarray, np.ndarray]:
        """Top-k (eigenvalues, eigenvectors-as-rows) of the correlation
        matrix, eigenvalues descending. Eigenvector signs are fixed so
        the largest-magnitude entry is positive (determinism for tests)."""
        corr = self.correlation_matrix(s)
        vals, vecs = np.linalg.eigh(corr)
        order = np.argsort(vals)[::-1][:k]
        vals, vecs = vals[order], vecs[:, order].T
        for i in range(len(vecs)):
            j = np.argmax(np.abs(vecs[i]))
            if vecs[i, j] < 0:
                vecs[i] = -vecs[i]
        return vals, vecs
