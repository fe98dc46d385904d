"""JVM-side pre-sampling (§4.2 fn.3: leaves may sample while reading)."""
import numpy as np

from repro.core.histogram import HistogramStreamingSketch
from repro.core.moments import CountSketch
from repro.engine.cache import ComputationCache
from repro.engine.tree import run_sketch


class TestPresample:
    def test_sample_size_near_rate(self, fl_table, fl_pdf):
        res = run_sketch(fl_table, CountSketch(), presample_rate=0.2)
        expect = 0.2 * len(fl_pdf)
        assert abs(res.value.rows - expect) < 0.05 * len(fl_pdf)

    def test_rate_one_is_noop(self, fl_table, fl_pdf):
        res = run_sketch(fl_table, CountSketch(), presample_rate=1.0)
        assert res.value.rows == len(fl_pdf)

    def test_scaled_histogram_close_to_exact(self, fl_table, fl_pdf):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 20)
        exact = run_sketch(fl_table, sk).value
        rate = 0.3
        sampled = run_sketch(fl_table, sk, presample_rate=rate, seed=4).value
        est = sampled.counts / rate
        rel = np.abs(est - exact.counts).max() / exact.counts.max()
        assert rel < 0.1

    def test_deterministic_given_seed(self, fl_table):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 20)
        a = run_sketch(fl_table, sk, presample_rate=0.3, seed=9).value
        b = run_sketch(fl_table, sk, presample_rate=0.3, seed=9).value
        assert np.array_equal(a.counts, b.counts)

    def test_presampled_not_cached_as_deterministic(self, fl_table):
        cache = ComputationCache()
        run_sketch(fl_table, CountSketch(), cache=cache, presample_rate=0.5, seed=1)
        r = run_sketch(fl_table, CountSketch(), cache=cache, presample_rate=0.5, seed=2)
        assert not r.from_cache  # different seed -> different sample

    def test_commutes_with_filters(self, fl_table, fl_pdf):
        sub = fl_table.filter("ua", lambda p: p["carrier"] == "UA")
        res = run_sketch(sub, CountSketch(), presample_rate=0.5, seed=3)
        expect = 0.5 * (fl_pdf["carrier"] == "UA").sum()
        assert abs(res.value.rows - expect) < 0.25 * expect + 10
