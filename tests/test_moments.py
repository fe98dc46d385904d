"""Moments/Range sketch — the prepare phase — vs pandas ground truth."""
import numpy as np
import pandas as pd
import pytest

from repro.core.moments import CountSketch, MomentsSketch
from repro.core.sketch import leaf_rng


class TestMoments:
    @pytest.mark.parametrize(
        "column", ["dep_delay", "arr_delay", "distance", "crs_dep_time", "taxi_out"]
    )
    def test_matches_pandas(self, fl_pdf, fl_parts, column):
        sk = MomentsSketch(column)
        s = sk.summarize_all(fl_parts)
        col = fl_pdf[column].dropna()
        assert s.count == len(col)
        assert s.missing == fl_pdf[column].isna().sum()
        assert s.min == col.min()
        assert s.max == col.max()
        assert abs(s.mean - col.mean()) < 1e-9 * max(1, abs(col.mean()))
        assert abs(s.variance - col.var(ddof=0)) < 1e-6 * max(1, col.var(ddof=0))

    def test_mergeability(self, fl_pdf, fl_parts):
        sk = MomentsSketch("dep_delay")
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert merged.count == whole.count
        assert merged.min == whole.min and merged.max == whole.max
        assert np.allclose(merged.power_sums, whole.power_sums)

    def test_higher_moments(self):
        pdf = pd.DataFrame({"x": [1.0, 2.0, 3.0]})
        sk = MomentsSketch("x", k_moments=4)
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert list(s.power_sums) == [6.0, 14.0, 36.0, 98.0]

    def test_empty_partition(self):
        sk = MomentsSketch("x")
        s = sk.summarize(pd.DataFrame({"x": []}), leaf_rng(0, 0))
        m = sk.merge(s, sk.summarize(pd.DataFrame({"x": [5.0]}), leaf_rng(0, 1)))
        assert m.min == 5.0 and m.max == 5.0 and m.count == 1

    def test_all_missing(self):
        s = MomentsSketch("x").summarize(
            pd.DataFrame({"x": [np.nan, np.nan]}), leaf_rng(0, 0)
        )
        assert s.count == 0 and s.missing == 2
        assert np.isnan(s.mean)

    def test_dates(self, fl_pdf):
        s = MomentsSketch("flight_date").summarize(fl_pdf, leaf_rng(0, 0))
        span_days = (s.max - s.min) / 86_400e9
        assert 700 <= span_days <= 731  # two-year period

    def test_needs_at_least_one_moment(self):
        with pytest.raises(ValueError):
            MomentsSketch("x", k_moments=0)


class TestCountSketch:
    def test_counts_all_rows(self, fl_pdf, fl_parts):
        sk = CountSketch()
        assert sk.summarize_all(fl_parts).rows == len(fl_pdf)

    def test_zero(self):
        assert CountSketch().zero().rows == 0
