"""O1–O11 (Fig. 4) through the vizketch engine, with oracle checks."""
import numpy as np
import pytest

from repro.engine.cache import ComputationCache
from repro.oracle import assert_equivalent
from repro.workload import Spreadsheet
from repro.workload.ops import ALL_OPS, COLD_SKIP, run_all


@pytest.fixture(scope="module")
def sheet(fl_table):
    return Spreadsheet(fl_table, cache=ComputationCache(), fanout=4, seed=3)


class TestAllOpsRun:
    @pytest.mark.parametrize("name", list(ALL_OPS))
    def test_op_produces_metrics(self, sheet, name):
        r = ALL_OPS[name](sheet)
        assert r.name == name
        assert r.wall_time > 0
        assert r.root_bytes > 0
        assert r.trees >= 1
        assert 0 <= r.first_partial_time <= r.wall_time + 1e-6

    def test_run_all_covers_everything(self, sheet):
        results = run_all(sheet)
        assert [r.name for r in results] == list(ALL_OPS)

    def test_cold_skip_set(self, sheet):
        results = run_all(sheet, skip=COLD_SKIP)
        names = {r.name for r in results}
        assert names.isdisjoint(COLD_SKIP)


class TestOpSemantics:
    def test_o1_sorted_view_matches_oracle(self, spark, sheet, fl_pdf):
        view, _ = sheet.sort_view("dep_delay", k=10)
        got = spark.createDataFrame(
            [(float(r[0]), int(c)) for r, c in zip(view.rows, view.counts)],
            "dep_delay double, cnt bigint",
        )
        assert_equivalent(
            got,
            """
            SELECT dep_delay, COUNT(*) AS cnt FROM fl
            WHERE dep_delay IS NOT NULL
            GROUP BY dep_delay ORDER BY dep_delay LIMIT 10
            """,
            fl=fl_pdf,
        )

    def test_o5_histogram_total_mass(self, sheet, fl_pdf):
        res, _ = sheet.histogram("dep_delay", sample=False, with_cdf=False)
        assert res.value.counts.sum() == fl_pdf["dep_delay"].notna().sum()

    def test_o6_filter_restricts_range(self, sheet, fl_pdf):
        zoomed = sheet.filtered("lt60", lambda p: p["dep_delay"] < 60)
        rng = zoomed.column_range("dep_delay")
        assert rng.max < 60
        assert rng.count == (fl_pdf["dep_delay"] < 60).sum()

    def test_o7_string_histogram_covers_all_rows(self, sheet, fl_pdf):
        res, _ = sheet.string_histogram("dest_city")
        assert res.value.counts.sum() == fl_pdf["dest_city"].notna().sum()

    def test_o8_heavy_hitters_sound(self, sheet, fl_pdf):
        hh, _ = sheet.heavy_hitters("carrier", k=15, method="sampling")
        truth = fl_pdf["carrier"].value_counts(normalize=True)
        assert hh, "no heavy hitters found"
        # Everything above 1/K must be found; nothing below 1/4K.
        for v, f in truth.items():
            if f >= 1 / 15:
                assert v in dict(hh)
        for v, _f in hh:
            assert truth[v] >= 1 / 60

    def test_o9_distinct_count_close(self, sheet, fl_pdf):
        est, _ = sheet.distinct_count("flight_num")
        true = fl_pdf["flight_num"].nunique()
        assert abs(est - true) / true < 0.06

    def test_o10_stacked_consistent(self, sheet, fl_pdf):
        res, _ = sheet.stacked_histogram(
            "dep_delay", "crs_dep_time", with_cdf=False
        )
        s = res.value
        assert np.array_equal(s.bar_counts, s.cell_counts.sum(axis=1))

    def test_o11_heatmap_mass(self, sheet, fl_pdf):
        res, _ = sheet.heatmap("dep_delay", "arr_delay")
        both = fl_pdf.dropna(subset=["dep_delay", "arr_delay"])
        got = res.value.cells.sum()
        if res.value.rows_sampled < res.value.rows_scanned:
            scale = res.value.rows_scanned / res.value.rows_sampled
            assert abs(got * scale - len(both)) / len(both) < 0.1
        else:
            assert got == len(both)


class TestCachingAcrossOps:
    def test_range_cached_between_charts(self, fl_table):
        cache = ComputationCache()
        s = Spreadsheet(fl_table, cache=cache, fanout=4)
        s.histogram("arr_delay", with_cdf=False)
        hits_before = cache.stats.hits
        s.histogram("arr_delay", with_cdf=False)  # range reused (§5.3)
        assert cache.stats.hits > hits_before


class TestScrollAndFind:
    def test_scroll_mid_lands_near_median(self, sheet, fl_pdf):
        view, _ = sheet.scroll_to("dep_delay", 0.5)
        top = view.rows[0][0]
        med = fl_pdf["dep_delay"].median()
        assert abs(top - med) <= 3

    def test_find_text_returns_match(self, sheet):
        view, _ = sheet.find_text("origin_city", "Hono", "origin_city", k=2)
        assert view.rows and all("Honolulu" in r[0] for r in view.rows)
