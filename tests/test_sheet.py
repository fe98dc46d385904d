"""Spreadsheet facade: action metrics, cache sharing, session history."""
import pytest

from repro.engine.cache import ComputationCache
from repro.workload import Spreadsheet


@pytest.fixture()
def sheet(fl_table):
    return Spreadsheet(fl_table, cache=ComputationCache(), fanout=4, seed=0)


class TestMetrics:
    def test_action_appends_history(self, sheet):
        assert sheet.history == []
        sheet.sort_view("carrier")
        sheet.column_range("dep_delay")
        assert [m.name for m in sheet.history] == [
            "sort('carrier',)", "range(dep_delay)",
        ]

    def test_chart_runs_prepare_then_render(self, sheet):
        _, m = sheet.histogram("arr_delay", with_cdf=True)
        assert m.trees == 3  # range + histogram + cdf
        assert m.root_bytes > 0

    def test_first_partial_not_after_completion(self, sheet):
        _, m = sheet.histogram("arr_delay", with_cdf=False)
        assert 0 <= m.first_partial_time <= m.wall_time + 1e-9

    def test_cached_rerun_is_cheap(self, sheet):
        sheet.column_range("distance")
        m2 = sheet.history[-1]
        sheet.column_range("distance")
        m3 = sheet.history[-1]
        assert m3.results[-1].from_cache
        assert m3.root_bytes == 0  # nothing crossed the network


class TestDerivedSheets:
    def test_filtered_sheet_shares_cache_and_history(self, sheet):
        sub = sheet.filtered("ua", lambda p: p["carrier"] == "UA")
        assert sub.cache is sheet.cache
        assert sub.history is sheet.history
        sub.column_range("dep_delay")
        assert sheet.history  # action recorded on the shared stream

    def test_filtered_range_is_narrower(self, sheet, fl_pdf):
        sub = sheet.filtered("early", lambda p: p["dep_delay"] < 0)
        rng = sub.column_range("dep_delay")
        assert rng.max < 0
        assert rng.count == (fl_pdf["dep_delay"] < 0).sum()

    def test_with_column_sheet(self, sheet):
        derived = sheet.with_column("hour", lambda p: p["crs_dep_time"] // 100)
        rng = derived.column_range("hour")
        assert 0 <= rng.min and rng.max <= 23

    def test_display_params_inherited(self, fl_table):
        s = Spreadsheet(fl_table, width=400, height=99, buckets=17, fanout=4)
        sub = s.filtered("x", lambda p: p["cancelled"] == 0)
        assert (sub.width, sub.height, sub.buckets) == (400, 99, 17)


class TestStringPath:
    def test_string_buckets_small_cardinality(self, sheet, fl_pdf):
        bounds = sheet.string_buckets("carrier")
        assert bounds == sorted(fl_pdf["carrier"].unique())

    def test_string_histogram_bucket_count_bounded(self, sheet):
        res, _ = sheet.string_histogram("dest_city")
        assert len(res.value.counts) <= sheet.buckets
