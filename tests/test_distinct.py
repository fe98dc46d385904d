"""HyperLogLog distinct counting, built from scratch."""
import numpy as np
import pandas as pd
import pytest

from repro.core.distinct import HyperLogLogSketch
from repro.core.sketch import leaf_rng


def frame_with_distincts(n_distinct: int, repeat: int = 3) -> pd.DataFrame:
    vals = [f"item-{i}" for i in range(n_distinct)] * repeat
    return pd.DataFrame({"v": vals})


class TestHLL:
    @pytest.mark.parametrize("true_n", [1, 10, 100, 1_000, 20_000, 100_000])
    def test_relative_error(self, true_n):
        sk = HyperLogLogSketch("v", p=12)
        s = sk.summarize(frame_with_distincts(true_n, repeat=1), leaf_rng(0, 0))
        est = sk.estimate(s)
        # 1.04/sqrt(4096) ~ 1.6% std error; allow 6% (plus small-range noise).
        assert abs(est - true_n) / true_n < 0.06

    def test_duplicates_do_not_inflate(self):
        sk = HyperLogLogSketch("v", p=12)
        once = sk.estimate(sk.summarize(frame_with_distincts(5000, 1), leaf_rng(0, 0)))
        thrice = sk.estimate(sk.summarize(frame_with_distincts(5000, 3), leaf_rng(0, 0)))
        assert once == thrice

    def test_merge_is_union(self):
        sk = HyperLogLogSketch("v", p=12)
        a = sk.summarize(
            pd.DataFrame({"v": [f"a{i}" for i in range(3000)]}), leaf_rng(0, 0)
        )
        b = sk.summarize(
            pd.DataFrame({"v": [f"b{i}" for i in range(3000)]}), leaf_rng(0, 1)
        )
        est = sk.estimate(sk.merge(a, b))
        assert abs(est - 6000) / 6000 < 0.06

    def test_merge_overlap_not_double_counted(self):
        sk = HyperLogLogSketch("v", p=12)
        pdf = frame_with_distincts(4000, 1)
        a = sk.summarize(pdf, leaf_rng(0, 0))
        est = sk.estimate(sk.merge(a, a))
        assert abs(est - 4000) / 4000 < 0.06

    def test_mergeability_partitioned(self, fl_pdf, fl_parts):
        sk = HyperLogLogSketch("origin")
        merged = sk.summarize_all(fl_parts)
        whole = sk.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.registers, whole.registers)

    def test_exact_on_flights_airports(self, fl_pdf, fl_parts):
        sk = HyperLogLogSketch("origin")
        est = sk.estimate(sk.summarize_all(fl_parts))
        true = fl_pdf["origin"].nunique()
        assert abs(est - true) / true < 0.06

    def test_missing_ignored(self):
        sk = HyperLogLogSketch("v")
        s = sk.summarize(pd.DataFrame({"v": ["a", None, "a"]}), leaf_rng(0, 0))
        assert 0.5 < sk.estimate(s) < 1.5

    def test_empty(self):
        sk = HyperLogLogSketch("v")
        assert sk.estimate(sk.zero()) == 0.0

    def test_summary_size_fixed(self):
        sk = HyperLogLogSketch("v", p=12)
        small = sk.summarize(frame_with_distincts(10), leaf_rng(0, 0))
        big = sk.summarize(frame_with_distincts(50_000, 1), leaf_rng(0, 0))
        assert small.registers.nbytes == big.registers.nbytes == 4096

    def test_p_validated(self):
        with pytest.raises(ValueError):
            HyperLogLogSketch("v", p=2)

    def test_numeric_column(self, fl_pdf):
        sk = HyperLogLogSketch("flight_num")
        est = sk.estimate(sk.summarize(fl_pdf, leaf_rng(0, 0)))
        true = fl_pdf["flight_num"].nunique()
        assert abs(est - true) / true < 0.06
