"""Hillview tables: base data plus derived views (paper §5.6).

A :class:`HillviewTable` wraps a Spark DataFrame (warm, in the data
cache) or a Parquet path (cold, re-read from storage on demand — the
soft-state model of §5.7). Derived tables are produced by two
operations, exactly the paper's set:

* **selection (filter)** — the derived table shares the parent's rows
  and records membership; at each leaf the filter predicate is
  evaluated over the partition batch and stored as a
  :class:`~repro.engine.membership.MembershipSet` (bitmap or sparse by
  density) before the sketch runs;
* **user-defined map** — a new column computed from existing ones at
  the leaves, never persisted (recomputed on demand, §5.6).

Ops are pure pandas-level functions so they are single-threaded and
serializable to the leaves via cloudpickle, like Hillview's Javascript
UDFs shipped to workers. ``version_id`` is a deterministic fingerprint
of the lineage, used as the computation-cache key component (§5.4).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.engine.membership import full_membership


@dataclass(frozen=True)
class TableOp:
    """One derivation step: ``filter`` (pdf -> bool mask) or ``map``
    (pdf -> new column values, named ``name``)."""

    kind: str  # "filter" | "map"
    name: str
    fn: Callable[[pd.DataFrame], pd.Series]

    def __post_init__(self):
        if self.kind not in ("filter", "map"):
            raise ValueError(f"unknown op kind {self.kind!r}")


@dataclass
class LeafStats:
    """What applying the ops at one leaf observed — membership sizes
    feed the engine's accounting and the membership-set tests."""

    base_rows: int = 0
    member_rows: int = 0
    membership_kind: str = "full"
    membership_bytes: int = 0


class HillviewTable:
    """A (possibly derived) table addressable by the engine."""

    def __init__(
        self,
        spark: SparkSession,
        df: DataFrame | None = None,
        parquet_path: str | None = None,
        ops: tuple[TableOp, ...] = (),
        base_id: str = "base",
    ):
        if (df is None) == (parquet_path is None):
            raise ValueError("provide exactly one of df or parquet_path")
        self.spark = spark
        self._df = df
        self.parquet_path = parquet_path
        self.ops = tuple(ops)
        self.base_id = base_id

    # -- identity ---------------------------------------------------------

    @property
    def version_id(self) -> str:
        """Deterministic lineage fingerprint for cache/redo-log keys."""
        chain = "/".join(f"{op.kind}:{op.name}" for op in self.ops)
        return f"{self.base_id}|{chain}" if chain else self.base_id

    # -- data access ------------------------------------------------------

    def dataframe(self) -> DataFrame:
        """Base data. Cold tables re-read from the repository each time
        (§5.4: no ingestion, no indexes; the repository is the truth)."""
        if self._df is not None:
            return self._df
        return self.spark.read.parquet(self.parquet_path)

    def is_cold(self) -> bool:
        return self._df is None

    # -- derivations (the §5.6 operations) --------------------------------

    def filter(self, name: str, predicate: Callable[[pd.DataFrame], pd.Series]) -> "HillviewTable":
        """Selection: derived table containing the rows where
        ``predicate`` holds. Shares base data; membership is computed
        per leaf when a sketch runs."""
        return self._derive(TableOp("filter", name, predicate))

    def with_column(self, name: str, fn: Callable[[pd.DataFrame], pd.Series]) -> "HillviewTable":
        """User-defined map: a new column computed at the leaves."""
        return self._derive(TableOp("map", name, fn))

    def _derive(self, op: TableOp) -> "HillviewTable":
        return HillviewTable(
            self.spark,
            df=self._df,
            parquet_path=self.parquet_path,
            ops=self.ops + (op,),
            base_id=self.base_id,
        )

    # -- leaf-side evaluation --------------------------------------------

    def apply_ops(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, LeafStats]:
        """Evaluate the derivation chain on one partition batch."""
        return apply_ops(self.ops, pdf)


def apply_ops(ops: tuple[TableOp, ...], pdf: pd.DataFrame) -> tuple[pd.DataFrame, LeafStats]:
    """Evaluate a derivation chain on one partition batch.

    Free function (not a method) so the Spark leaf closure captures only
    the picklable ``ops`` tuple, never the SparkSession-bearing table.

    Filters are realized through membership sets: each filter's mask
    (evaluated over base-partition rows) is intersected into the
    partition's membership, stored as a bitmap or sparse index array by
    density, and only at the end are the member rows materialized for
    the sketch. Map columns are appended in chain order over all base
    rows — the paper computes derived columns at the leaves and keeps
    them only in cache (§5.6); a map after a filter may produce NaN on
    non-member rows, which the membership then hides.
    """
    stats = LeafStats(base_rows=len(pdf))
    work = pdf
    membership = full_membership(len(pdf))
    for op in ops:
        if op.kind == "map":
            work = work.assign(**{op.name: op.fn(work)})
        else:
            mask = op.fn(work)
            mask = mask.fillna(False).to_numpy(dtype=bool)
            membership = membership.intersect_mask(mask)
    out = work.iloc[membership.indices()]
    stats.member_rows = membership.size()
    stats.membership_kind = type(membership).__name__
    stats.membership_bytes = membership.memory_bytes()
    return out.reset_index(drop=True), stats
