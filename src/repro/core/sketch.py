"""Base protocol for vizketches (paper §4.1–4.2, Appendix A).

A vizketch is a mergeable summarization method: ``summarize(D)`` maps a
local multiset of rows to a small summary, and ``merge(S, S')`` combines
two summaries, satisfying

    summarize(D1 ⊎ D2) == merge(summarize(D1), summarize(D2))

(exactly for streaming vizketches; in distribution for sampled ones,
where each leaf draws from its own seeded generator). Summary size is a
function of the *display description* (bars, pixels, color shades), not
of ``|D|`` — that is the property that makes every Hillview query
scalable by construction (§1).

The functions here are deliberately single-threaded and pure: the
engine (:mod:`repro.engine.tree`) handles partitioning, the aggregation
tree, byte accounting, progressive partial results, and determinism via
per-leaf seeds. This file is the whole contract a new vizketch must
implement — the paper's modularity claim (§5.5) made concrete.
"""
from __future__ import annotations

import pickle
import zlib
from abc import ABC, abstractmethod
from typing import Any, Generic, TypeVar

import numpy as np
import pandas as pd

S = TypeVar("S")


def leaf_rng(seed: int, partition_id: int) -> np.random.Generator:
    """Deterministic per-leaf generator.

    The redo log stores ``seed`` (§5.8); replay after a failure
    re-creates the identical sample at every leaf, so a restarted node
    stays consistent with nodes that never crashed.
    """
    return np.random.default_rng(
        np.random.SeedSequence(entropy=seed, spawn_key=(partition_id,))
    )


class Sketch(ABC, Generic[S]):
    """A mergeable summary tuned for one visualization.

    Subclasses implement ``zero`` (identity for ``merge``),
    ``summarize`` and ``merge``. ``deterministic`` marks sketches whose
    summarize pass scans all rows (streaming) versus sampling-based
    ones; the engine's computation cache only reuses deterministic
    results across queries, matching §5.4.
    """

    #: True iff summarize is a full scan with no randomness.
    deterministic: bool = True

    @abstractmethod
    def zero(self) -> S:
        """The identity summary: ``merge(zero(), s) == s``."""

    @abstractmethod
    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> S:
        """Summarize one leaf's rows (a pandas batch of the partition)."""

    @abstractmethod
    def merge(self, a: S, b: S) -> S:
        """Combine two summaries; must be associative and commutative."""

    def cache_key(self) -> str:
        """Stable identity of this computation for the computation cache.

        Default: class name plus the sorted public attribute dict. Any
        attribute that parameterizes the result must be a plain value.
        """
        attrs = {
            k: v
            for k, v in sorted(vars(self).items())
            if not k.startswith("_")
        }
        return f"{type(self).__name__}({attrs})"

    # -- serialization: summaries cross tree edges as bytes (§5.5 note 1)

    def to_bytes(self, s: S) -> bytes:
        """Serialize a summary for transmission up the tree.

        The engine charges ``len(to_bytes(s))`` to the receiving edge;
        this is the quantity behind Fig. 5's bandwidth comparison.
        """
        return zlib.compress(pickle.dumps(s, protocol=5), level=1)

    def from_bytes(self, b: bytes) -> S:
        return pickle.loads(zlib.decompress(b))

    # -- convenience

    def summarize_all(self, parts: list[pd.DataFrame], seed: int = 0) -> S:
        """Run the full summarize/merge pipeline locally (no Spark).

        Used by unit tests and the single-thread microbenchmark (§7.2.1),
        where the computation tree has one leaf directly under the root.
        """
        out = self.zero()
        for pid, pdf in enumerate(parts):
            out = self.merge(out, self.summarize(pdf, leaf_rng(seed, pid)))
        return out


def require_columns(pdf: pd.DataFrame, *cols: str) -> None:
    """Fail fast with a clear message when a sketch targets a missing column."""
    missing = [c for c in cols if c not in pdf.columns]
    if missing:
        raise KeyError(f"sketch requires missing column(s) {missing}; have {list(pdf.columns)}")


def numeric_values(pdf: pd.DataFrame, column: str) -> np.ndarray:
    """Non-missing values of a numeric (or date) column as float64.

    Dates are converted to nanosecond epochs — the paper treats any
    value "readily converted to a real number" as numeric (§4.3).
    """
    require_columns(pdf, column)
    s = pdf[column]
    if pd.api.types.is_datetime64_any_dtype(s):
        # ns-epoch ints; NaT's sentinel int is masked back to NaN.
        vals = s.to_numpy().view("int64").astype("float64")
        vals[s.isna().to_numpy()] = np.nan
    elif pd.api.types.is_float_dtype(s) and s.dtype == np.float64:
        vals = s.to_numpy()  # zero-copy fast path for the common case
    elif pd.api.types.is_numeric_dtype(s):
        vals = s.to_numpy(dtype="float64", na_value=np.nan)
    else:
        vals = pd.to_numeric(s, errors="coerce").to_numpy(
            dtype="float64", na_value=np.nan
        )
    return vals[~np.isnan(vals)]


def sample_mask(n_rows: int, rate: float, rng: np.random.Generator) -> np.ndarray:
    """Bernoulli sampling mask at ``rate`` — the leaf-side sampling step.

    Each leaf samples independently at the global target rate, so the
    union of leaf samples is a uniform sample of the whole dataset
    regardless of how rows are sharded (§4.2: sharding can be arbitrary).
    """
    if rate >= 1.0:
        return np.ones(n_rows, dtype=bool)
    return rng.random(n_rows) < rate


def _pickle_size(obj: Any) -> int:
    return len(pickle.dumps(obj, protocol=5))
