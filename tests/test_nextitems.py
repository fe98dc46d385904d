"""Next-items and find-text vizketches against a DuckDB oracle."""
import duckdb
import pandas as pd
import pytest

from repro.core.nextitems import FindTextSketch, NextItemsSketch, SortOrder
from repro.core.sketch import leaf_rng


def oracle_page(pdf, cols, ascending, k, where="TRUE"):
    """Distinct displayed tuples with duplicate counts, via DuckDB."""
    order = ", ".join(
        f'"{c}" {"ASC" if a else "DESC"} NULLS LAST'
        for c, a in zip(cols, ascending)
    )
    sel = ", ".join(f'"{c}"' for c in cols)
    con = duckdb.connect()
    try:
        con.register("t", pdf)
        rows = con.execute(
            f"SELECT {sel}, COUNT(*) AS cnt FROM t WHERE {where} "
            f"GROUP BY {sel} ORDER BY {order} LIMIT {k}"
        ).fetchall()
    finally:
        con.close()
    return [(tuple(r[:-1]), r[-1]) for r in rows]


class TestSortOrder:
    def test_ascending_key(self):
        o = SortOrder.of("a")
        assert o.key((1,)) < o.key((2,))

    def test_descending_key(self):
        o = SortOrder.of(("a", False))
        assert o.key((2,)) < o.key((1,))

    def test_descending_strings(self):
        o = SortOrder.of(("a", False))
        assert o.key(("z",)) < o.key(("a",))

    def test_missing_sorts_last_both_directions(self):
        asc, desc = SortOrder.of("a"), SortOrder.of(("a", False))
        assert asc.key((1,)) < asc.key((None,))
        assert desc.key((1,)) < desc.key((None,))

    def test_lexicographic(self):
        o = SortOrder.of("a", ("b", False))
        assert o.key((1, 5)) < o.key((1, 3))
        assert o.key((0, 0)) < o.key((1, 9))


class TestNextItems:
    @pytest.mark.parametrize(
        "cols,asc",
        [
            (["dep_delay"], [True]),
            (["dep_delay"], [False]),
            (["origin"], [True]),
            (["carrier", "dep_delay"], [True, False]),
            (["origin", "dest"], [True, True]),
        ],
    )
    def test_first_page_matches_oracle(self, fl_pdf, fl_parts, cols, asc):
        order = SortOrder.of(*[(c, a) for c, a in zip(cols, asc)])
        sk = NextItemsSketch(order, k=10)
        got = sk.summarize_all(fl_parts)
        expected = oracle_page(fl_pdf, cols, asc, 10)
        assert [tuple(r) for r in got.rows] == [e[0] for e in expected]
        assert got.counts == [e[1] for e in expected]

    def test_paging_after_row(self, fl_pdf, fl_parts):
        order = SortOrder.of("origin")
        page1 = NextItemsSketch(order, k=5).summarize_all(fl_parts)
        page2 = NextItemsSketch(order, k=5, after=page1.rows[-1]).summarize_all(
            fl_parts
        )
        expected = oracle_page(fl_pdf, ["origin"], [True], 10)
        assert [tuple(r) for r in page1.rows + page2.rows] == [
            e[0] for e in expected
        ]

    def test_counts_aggregate_duplicates(self, fl_pdf, fl_parts):
        sk = NextItemsSketch(SortOrder.of("carrier"), k=3)
        got = sk.summarize_all(fl_parts)
        vc = fl_pdf["carrier"].value_counts()
        for row, cnt in zip(got.rows, got.counts):
            assert cnt == vc[row[0]]

    def test_mergeability(self, fl_pdf, fl_parts):
        order = SortOrder.of("dest", ("dep_delay", False))
        sk = NextItemsSketch(order, k=8)
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert merged.rows == whole.rows and merged.counts == whole.counts

    def test_k_bounds_summary(self, fl_parts):
        got = NextItemsSketch(SortOrder.of("origin"), k=4).summarize_all(fl_parts)
        assert len(got.rows) <= 4

    def test_empty_frame(self):
        sk = NextItemsSketch(SortOrder.of("x"), k=3)
        s = sk.summarize(pd.DataFrame({"x": []}), leaf_rng(0, 0))
        assert s.rows == []

    def test_dates_sortable(self, fl_parts):
        got = NextItemsSketch(SortOrder.of("flight_date"), k=2).summarize_all(
            fl_parts
        )
        assert got.rows[0][0] <= got.rows[1][0]


class TestFindText:
    def test_substring_case_insensitive(self, fl_pdf, fl_parts):
        sk = FindTextSketch(
            "origin_city", "hono", SortOrder.of("origin_city"), k=3
        )
        got = sk.summarize_all(fl_parts)
        assert all("Honolulu" in r[0] for r in got.rows)

    def test_exact_match(self, fl_parts):
        sk = FindTextSketch(
            "origin", "SFO", SortOrder.of("origin", "dest"), k=2, mode="exact"
        )
        got = sk.summarize_all(fl_parts)
        assert all(r[0] == "SFO" for r in got.rows)

    def test_case_sensitive_no_match(self, fl_parts):
        sk = FindTextSketch(
            "origin", "sfo", SortOrder.of("origin"), k=2, mode="exact",
            case_sensitive=True,
        )
        assert sk.summarize_all(fl_parts).rows == []

    def test_regex(self, fl_pdf, fl_parts):
        sk = FindTextSketch(
            "origin", "^(?:SFO|SJC)$", SortOrder.of("origin"), k=5, mode="regex"
        )
        got = sk.summarize_all(fl_parts)
        assert {r[0] for r in got.rows} <= {"SFO", "SJC"}

    def test_matches_oracle_counts(self, fl_pdf, fl_parts):
        sk = FindTextSketch(
            "dest_city", "New", SortOrder.of("dest_city"), k=10
        )
        got = sk.summarize_all(fl_parts)
        expected = oracle_page(
            fl_pdf, ["dest_city"], [True], 10,
            where="dest_city ILIKE '%new%'",
        )
        assert [tuple(r) for r in got.rows] == [e[0] for e in expected]
        assert got.counts == [e[1] for e in expected]

    def test_bad_mode_rejected(self):
        with pytest.raises(ValueError):
            FindTextSketch("c", "x", SortOrder.of("c"), mode="fuzzy")
