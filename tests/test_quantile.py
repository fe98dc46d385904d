"""Scroll-bar quantile vizketch (Thm. 2 accuracy)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.quantile import QuantileSketch, quantile_sample_size
from repro.core.sketch import leaf_rng


class TestQuantile:
    @pytest.mark.parametrize("q", [0.0, 0.1, 0.25, 0.5, 0.75, 0.9, 1.0])
    def test_rank_error_within_half_pixel(self, fl_pdf, fl_parts, q):
        """The returned element's true relative rank is within ~1/(2V)
        of the requested quantile (ε = 1/2V in App. C.1)."""
        v = 50
        sk = QuantileSketch("dep_delay", v_pixels=v, total_rows=len(fl_pdf))
        s = sk.summarize_all(fl_parts)
        got = sk.quantile(s, q)
        vals = np.sort(fl_pdf["dep_delay"].dropna().to_numpy())
        rank = np.searchsorted(vals, got, side="left") / len(vals)
        assert abs(rank - q) <= 1.5 / (2 * v) + 0.02

    def test_monotone_in_q(self, fl_pdf, fl_parts):
        sk = QuantileSketch("dep_delay", v_pixels=50, total_rows=len(fl_pdf))
        s = sk.summarize_all(fl_parts)
        qs = [sk.quantile(s, q) for q in np.linspace(0, 1, 11)]
        assert qs == sorted(qs)

    def test_sample_bounded_by_display(self, fl_pdf, fl_parts):
        sk = QuantileSketch("dep_delay", v_pixels=20, total_rows=len(fl_pdf))
        s = sk.summarize_all(fl_parts)
        # Expected sample size == n_target regardless of data size.
        assert len(s.values) < 3 * sk.n_target

    def test_sample_size_formula(self):
        assert quantile_sample_size(100) < quantile_sample_size(200)

    def test_merge_concatenates_sorted(self):
        sk = QuantileSketch("x", v_pixels=10, total_rows=100)
        a = sk.summarize(pd.DataFrame({"x": [3.0, 1.0]}), leaf_rng(0, 0))
        b = sk.summarize(pd.DataFrame({"x": [2.0]}), leaf_rng(0, 1))
        m = sk.merge(a, b)
        assert list(m.values) == [1.0, 2.0, 3.0]
        assert m.rows_scanned == 3

    def test_empty_sample_raises(self):
        sk = QuantileSketch("x", v_pixels=10, total_rows=100)
        with pytest.raises(ValueError):
            sk.quantile(sk.zero(), 0.5)

    def test_not_deterministic(self):
        assert not QuantileSketch("x", 10, 100).deterministic
