"""Histogram vizketches: exactness, mergeability, sampling error bounds."""
import numpy as np
import pandas as pd
import pytest

from repro.core.histogram import (
    BinCounts,
    HistogramSamplingSketch,
    HistogramStreamingSketch,
    StringHistogramSketch,
    bucket_indices,
    histogram_sample_size,
    render_histogram,
)
from repro.core.sketch import leaf_rng


class TestBucketIndices:
    def test_left_edge_inclusive(self):
        idx = bucket_indices(np.array([0.0]), 0.0, 10.0, 10)
        assert idx[0] == 0

    def test_right_edge_lands_in_last_bucket(self):
        idx = bucket_indices(np.array([10.0]), 0.0, 10.0, 10)
        assert idx[0] == 9

    def test_interior(self):
        idx = bucket_indices(np.array([0.5, 5.0, 9.99]), 0.0, 10.0, 10)
        assert list(idx) == [0, 5, 9]

    def test_out_of_range_marked(self):
        idx = bucket_indices(np.array([-1.0, 11.0]), 0.0, 10.0, 10)
        assert list(idx) == [-1, -1]

    def test_degenerate_range(self):
        idx = bucket_indices(np.array([5.0, 6.0]), 5.0, 5.0, 10)
        assert idx[0] == 0 and idx[1] == -1


class TestStreamingHistogram:
    @pytest.mark.parametrize("buckets", [1, 5, 40, 127])
    def test_counts_match_numpy(self, fl_pdf, buckets):
        lo, hi = -30.0, 120.0
        sk = HistogramStreamingSketch("dep_delay", lo, hi, buckets)
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        vals = fl_pdf["dep_delay"].dropna().to_numpy()
        vals = vals[(vals >= lo) & (vals <= hi)]
        expected, _ = np.histogram(vals, bins=buckets, range=(lo, hi))
        assert np.array_equal(s.counts, expected)

    def test_mergeability_exact(self, fl_pdf, fl_parts):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 50)
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.counts, whole.counts)
        assert merged.missing == whole.missing
        assert merged.rows_scanned == whole.rows_scanned

    def test_zero_is_identity(self, fl_pdf):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 50)
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        z = sk.merge(sk.zero(), s)
        assert np.array_equal(z.counts, s.counts)

    def test_merge_commutative(self, fl_parts):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 50)
        a = sk.summarize(fl_parts[0], leaf_rng(0, 0))
        b = sk.summarize(fl_parts[1], leaf_rng(0, 1))
        ab, ba = sk.merge(a, b), sk.merge(b, a)
        assert np.array_equal(ab.counts, ba.counts)

    def test_missing_counted(self):
        pdf = pd.DataFrame({"x": [1.0, np.nan, np.nan, 2.0]})
        sk = HistogramStreamingSketch("x", 0, 10, 5)
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert s.missing == 2 and s.rows_scanned == 2

    def test_deterministic_flag(self):
        assert HistogramStreamingSketch("x", 0, 1, 2).deterministic


class TestSamplingHistogram:
    def test_full_rate_equals_streaming(self, fl_pdf):
        exact = HistogramStreamingSketch("dep_delay", -30, 120, 50)
        sampled = HistogramSamplingSketch(
            "dep_delay", -30, 120, 50, v_pixels=200, total_rows=10
        )  # tiny total_rows -> rate 1.0
        assert sampled.rate == 1.0
        se = exact.summarize(fl_pdf, leaf_rng(0, 0))
        ss = sampled.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(se.counts, ss.counts)

    def test_sample_size_display_driven(self):
        # The target depends only on the display, never the data size.
        n1 = histogram_sample_size(200)
        assert n1 == histogram_sample_size(200)
        assert histogram_sample_size(100) < histogram_sample_size(200)

    @pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
    def test_pixel_error_bound(self, fl_pdf, seed):
        """Rendered bar heights within ~1 pixel of the exact rendering
        (Thm. 3's guarantee at the practical CV² sample size)."""
        v = 100
        lo, hi = -30.0, 120.0
        exact = HistogramStreamingSketch("dep_delay", lo, hi, 50)
        e = exact.summarize(fl_pdf, leaf_rng(seed, 0))
        sk = HistogramSamplingSketch(
            "dep_delay", lo, hi, 50, v_pixels=v, total_rows=len(fl_pdf), c=2.0
        )
        s = sk.summarize(fl_pdf, leaf_rng(seed, 0))
        est = sk.estimate_counts(s)
        exact_px = render_histogram(e, v)
        approx_px = render_histogram(
            BinCounts(counts=est, rows_scanned=s.rows_scanned, rows_sampled=s.rows_sampled),
            v,
        )
        assert np.abs(exact_px - approx_px).max() <= 2  # 1px + rounding slack

    def test_estimates_unbiased_scale(self, fl_pdf):
        sk = HistogramSamplingSketch(
            "dep_delay", -30, 120, 50, v_pixels=30, total_rows=len(fl_pdf), c=1.0
        )
        assert sk.rate < 1.0
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        est_total = sk.estimate_counts(s).sum()
        true_total = HistogramStreamingSketch("dep_delay", -30, 120, 50).summarize(
            fl_pdf, leaf_rng(0, 0)
        ).counts.sum()
        assert abs(est_total - true_total) / true_total < 0.1

    def test_mergeable_sampled(self, fl_parts):
        sk = HistogramSamplingSketch(
            "dep_delay", -30, 120, 50, v_pixels=80, total_rows=13_000
        )
        merged = sk.summarize_all(fl_parts, seed=5)
        assert merged.rows_sampled == sum(
            sk.summarize(p, leaf_rng(5, i)).rows_sampled
            for i, p in enumerate(fl_parts)
        )

    def test_not_deterministic(self):
        sk = HistogramSamplingSketch("x", 0, 1, 10, 100, total_rows=10**9)
        assert not sk.deterministic


class TestRender:
    def test_tallest_bar_hits_v(self):
        s = BinCounts(counts=np.array([1, 4, 2]))
        px = render_histogram(s, 100)
        assert px.max() == 100 and px[1] == 100

    def test_all_empty(self):
        px = render_histogram(BinCounts(counts=np.zeros(3, dtype=np.int64)), 100)
        assert px.sum() == 0

    def test_proportionality(self):
        px = render_histogram(BinCounts(counts=np.array([2, 4])), 100)
        assert px[0] == 50


class TestStringHistogram:
    def test_counts_per_bucket(self):
        pdf = pd.DataFrame({"s": ["apple", "banana", "cherry", "avocado", "fig"]})
        sk = StringHistogramSketch("s", ["a", "c"])
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert list(s.counts) == [3, 2]  # a*,b* | c..z

    def test_missing(self):
        pdf = pd.DataFrame({"s": ["a", None, "b"]})
        s = StringHistogramSketch("s", ["a"]).summarize(pdf, leaf_rng(0, 0))
        assert s.missing == 1 and s.counts.sum() == 2

    def test_mergeability(self, fl_pdf, fl_parts):
        sk = StringHistogramSketch("origin", ["A", "H", "O"])
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.counts, whole.counts)

    def test_requires_boundaries(self):
        with pytest.raises(ValueError):
            StringHistogramSketch("s", [])
