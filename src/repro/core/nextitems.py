"""Next-items and find-text vizketches for the tabular view (§4.3, B.2).

``NextItemsSketch`` renders one screen of the spreadsheet: given the
current top row R (or ``None`` for the start), a sort order over the
displayed columns, and a page size K, it returns the K smallest
*distinct* displayed-row tuples strictly after R, each with its
duplicate count (§3.3: selecting few columns aggregates duplicates and
shows repetition counts). ``summarize`` keeps a K-bounded heap per
leaf; ``merge`` combines heaps and re-trims to K — the classic
mergeable top-K.

``FindTextSketch`` is the same computation restricted to rows matching
a search criterion (exact / substring / regexp, case-sensitive or not),
implementing the spreadsheet's find-next (App. B.2).
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field
from functools import total_ordering

import numpy as np
import pandas as pd

from repro.core.sketch import Sketch, require_columns


@total_ordering
class _Rev:
    """Wrapper that reverses the natural order, for descending sorts."""

    __slots__ = ("v",)

    def __init__(self, v):
        self.v = v

    def __eq__(self, other):
        return self.v == other.v

    def __lt__(self, other):
        return other.v < self.v

    def __repr__(self):
        return f"Rev({self.v!r})"


def _scalar(v):
    """Normalize cell values to plain hashable Python scalars."""
    if v is None:
        return None
    if isinstance(v, float) and np.isnan(v):
        return None
    if isinstance(v, np.generic):
        return v.item()
    if isinstance(v, pd.Timestamp):
        return v.to_pydatetime()
    return v


@dataclass(frozen=True)
class SortOrder:
    """Lexicographic order over ``columns`` with per-column direction.

    Missing values sort after everything regardless of direction,
    matching how the tabular view pushes missing cells to the end.
    """

    columns: tuple[str, ...]
    ascending: tuple[bool, ...]

    @staticmethod
    def of(*specs: tuple[str, bool] | str) -> "SortOrder":
        cols, asc = [], []
        for s in specs:
            if isinstance(s, str):
                cols.append(s)
                asc.append(True)
            else:
                cols.append(s[0])
                asc.append(bool(s[1]))
        return SortOrder(tuple(cols), tuple(asc))

    def key(self, row: tuple) -> tuple:
        out = []
        for v, up in zip(row, self.ascending):
            v = _scalar(v)
            if v is None:
                out.append((1, 0))
            elif up:
                out.append((0, v))
            else:
                out.append((0, _Rev(v)))
        return tuple(out)


@dataclass
class TopRows:
    """K smallest distinct row tuples after R, with duplicate counts."""

    rows: list[tuple] = field(default_factory=list)  # kept in sort order
    counts: list[int] = field(default_factory=list)


class NextItemsSketch(Sketch[TopRows]):
    """One page of the sorted, duplicate-aggregated tabular view."""

    deterministic = True

    def __init__(
        self,
        order: SortOrder,
        k: int = 20,
        after: tuple | None = None,
    ):
        self.order = order
        self.k = int(k)
        self.after = tuple(_scalar(v) for v in after) if after is not None else None

    def cache_key(self) -> str:
        return f"NextItems({self.order},k={self.k},after={self.after})"

    def zero(self) -> TopRows:
        return TopRows()

    def _row_filter(self, pdf: pd.DataFrame) -> pd.DataFrame:
        """Hook for subclasses (find-text) to restrict candidate rows."""
        return pdf

    def summarize(self, pdf: pd.DataFrame, rng: np.random.Generator) -> TopRows:
        require_columns(pdf, *self.order.columns)
        pdf = self._row_filter(pdf)
        cols = list(self.order.columns)
        if pdf.empty:
            return TopRows()
        # Aggregate duplicates of the displayed tuple, then keep the K
        # smallest tuples strictly greater than the current top row R.
        grouped = pdf.groupby(cols, dropna=False, sort=False).size()
        items: dict[tuple, int] = {}
        for key_vals, cnt in grouped.items():
            if not isinstance(key_vals, tuple):
                key_vals = (key_vals,)
            row = tuple(_scalar(v) for v in key_vals)
            items[row] = items.get(row, 0) + int(cnt)
        return self._trim(items)

    def _trim(self, items: dict[tuple, int]) -> TopRows:
        after_key = self.order.key(self.after) if self.after is not None else None
        kept = [
            (self.order.key(r), r, c)
            for r, c in items.items()
            if after_key is None or self.order.key(r) > after_key
        ]
        kept.sort(key=lambda t: t[0])
        kept = kept[: self.k]
        return TopRows(rows=[r for _, r, _ in kept], counts=[c for _, _, c in kept])

    def merge(self, a: TopRows, b: TopRows) -> TopRows:
        items: dict[tuple, int] = {}
        for s in (a, b):
            for r, c in zip(s.rows, s.counts):
                items[r] = items.get(r, 0) + c
        return self._trim(items)


class FindTextSketch(NextItemsSketch):
    """Find the next row(s) matching a free-form text criterion (B.2)."""

    def __init__(
        self,
        column: str,
        pattern: str,
        order: SortOrder,
        k: int = 1,
        after: tuple | None = None,
        mode: str = "substring",  # exact | substring | regex
        case_sensitive: bool = False,
    ):
        super().__init__(order, k=k, after=after)
        if mode not in ("exact", "substring", "regex"):
            raise ValueError(f"unknown find mode {mode!r}")
        self.column = column
        self.pattern = pattern
        self.mode = mode
        self.case_sensitive = bool(case_sensitive)

    def cache_key(self) -> str:
        return (
            f"FindText({self.column},{self.pattern!r},{self.mode},"
            f"cs={self.case_sensitive},{self.order},k={self.k},after={self.after})"
        )

    def _row_filter(self, pdf: pd.DataFrame) -> pd.DataFrame:
        require_columns(pdf, self.column)
        s = pdf[self.column].astype(str)
        if self.mode == "exact":
            if self.case_sensitive:
                mask = s == self.pattern
            else:
                mask = s.str.lower() == self.pattern.lower()
        elif self.mode == "substring":
            mask = s.str.contains(
                re.escape(self.pattern), case=self.case_sensitive, regex=True
            )
        else:
            mask = s.str.contains(
                self.pattern, case=self.case_sensitive, regex=True
            )
        return pdf[mask.fillna(False)]
