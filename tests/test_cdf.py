"""CDF vizketch: monotonicity, pixel-level accuracy, exact mode."""
import numpy as np
import pytest

from repro.core.histogram import CDFSketch
from repro.core.sketch import leaf_rng


@pytest.fixture(scope="module")
def exact_cdf(fl_pdf):
    """Ground-truth in-range CDF with np.histogram's bin semantics
    (right-exclusive except the last bin — same as bucket_indices)."""

    def make(h, lo, hi):
        vals = fl_pdf["dep_delay"].dropna().to_numpy()
        counts, _ = np.histogram(vals, bins=h, range=(lo, hi))
        return np.cumsum(counts) / counts.sum()

    return make


class TestCDFExactMode:
    def test_matches_searchsorted(self, fl_pdf, exact_cdf):
        # Range covers the data (as the Moments prepare phase ensures),
        # so the sketch's sample normalization equals the in-range CDF.
        h, v = 100, 100
        lo = fl_pdf["dep_delay"].min()
        hi = fl_pdf["dep_delay"].max()
        sk = CDFSketch("dep_delay", lo, hi, h, v, total_rows=len(fl_pdf), sample=False)
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        got = np.cumsum(s.counts) / s.rows_sampled
        # The sketch drops out-of-range values; compare on in-range mass.
        assert np.allclose(got, exact_cdf(h, lo, hi), atol=1e-12)

    def test_exact_mode_deterministic_flag(self, fl_pdf):
        sk = CDFSketch("dep_delay", -30, 120, 50, 50, total_rows=len(fl_pdf), sample=False)
        assert sk.deterministic


class TestCDFSampled:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_per_pixel_error(self, fl_pdf, exact_cdf, seed):
        """App. C.2: each horizontal pixel's cdf value within ±0.6/V
        w.h.p.; we allow 1.5 rendered pixels of slack for rounding."""
        h, v = 200, 100
        lo = fl_pdf["dep_delay"].min()
        hi = fl_pdf["dep_delay"].max()
        sk = CDFSketch("dep_delay", lo, hi, h, v, total_rows=len(fl_pdf), c=2.0)
        s = sk.summarize(fl_pdf, leaf_rng(seed, 0))
        got_px = sk.render(s)
        true_px = np.rint(exact_cdf(h, lo, hi) * v)
        assert np.abs(got_px - true_px).max() <= 1.5

    def test_render_monotone(self, fl_pdf):
        sk = CDFSketch("dep_delay", -30, 120, 100, 100, total_rows=len(fl_pdf))
        px = sk.render(sk.summarize(fl_pdf, leaf_rng(1, 0)))
        assert (np.diff(px) >= 0).all()

    def test_render_reaches_top(self, fl_pdf):
        sk = CDFSketch("dep_delay", -30, 200, 100, 100, total_rows=len(fl_pdf))
        px = sk.render(sk.summarize(fl_pdf, leaf_rng(1, 0)))
        assert px[-1] == 100

    def test_empty_summary_renders_flat(self, fl_pdf):
        sk = CDFSketch("dep_delay", -30, 120, 50, 100, total_rows=len(fl_pdf))
        assert sk.render(sk.zero()).sum() == 0

    def test_mergeability(self, fl_pdf, fl_parts):
        sk = CDFSketch(
            "dep_delay", -30, 120, 100, 100, total_rows=len(fl_pdf), sample=False
        )
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.counts, whole.counts)

    def test_target_independent_of_data(self):
        a = CDFSketch("x", 0, 1, 100, 100, total_rows=10**6)
        b = CDFSketch("x", 0, 1, 100, 100, total_rows=10**9)
        assert a.n_target == b.n_target  # display-driven
        assert a.rate > b.rate  # bigger data -> more aggressive sampling
