"""Base sketch machinery: RNG determinism, value extraction, sampling."""
import numpy as np
import pandas as pd
import pytest

from repro.core.moments import MomentsSketch
from repro.core.sketch import leaf_rng, numeric_values, require_columns, sample_mask


class TestLeafRng:
    def test_deterministic_per_seed_and_partition(self):
        a = leaf_rng(7, 3).random(5)
        b = leaf_rng(7, 3).random(5)
        assert np.array_equal(a, b)

    @pytest.mark.parametrize("pid", [0, 1, 2, 17])
    def test_partitions_draw_differently(self, pid):
        base = leaf_rng(7, 999).random(5)
        other = leaf_rng(7, pid).random(5)
        assert not np.array_equal(base, other)

    def test_seeds_draw_differently(self):
        assert not np.array_equal(leaf_rng(1, 0).random(5), leaf_rng(2, 0).random(5))


class TestNumericValues:
    def test_drops_missing(self):
        pdf = pd.DataFrame({"x": [1.0, np.nan, 3.0]})
        assert list(numeric_values(pdf, "x")) == [1.0, 3.0]

    def test_ints(self):
        pdf = pd.DataFrame({"x": [1, 2, 3]})
        assert list(numeric_values(pdf, "x")) == [1.0, 2.0, 3.0]

    def test_dates_become_ns_epochs(self):
        pdf = pd.DataFrame({"d": pd.to_datetime(["2020-01-01", "2020-01-02"])})
        vals = numeric_values(pdf, "d")
        assert vals[1] - vals[0] == 86_400e9

    def test_dates_with_nat(self):
        pdf = pd.DataFrame({"d": pd.to_datetime(["2020-01-01", None])})
        assert len(numeric_values(pdf, "d")) == 1

    def test_non_numeric_strings_dropped(self):
        pdf = pd.DataFrame({"x": ["1", "two", "3"]})
        assert list(numeric_values(pdf, "x")) == [1.0, 3.0]

    def test_missing_column_raises(self):
        with pytest.raises(KeyError, match="nope"):
            numeric_values(pd.DataFrame({"x": [1]}), "nope")


class TestRequireColumns:
    def test_ok(self):
        require_columns(pd.DataFrame({"a": [1], "b": [2]}), "a", "b")

    def test_missing_lists_names(self):
        with pytest.raises(KeyError, match="'b'"):
            require_columns(pd.DataFrame({"a": [1]}), "a", "b")


class TestSampleMask:
    def test_rate_one_keeps_all(self):
        m = sample_mask(100, 1.0, leaf_rng(0, 0))
        assert m.all() and len(m) == 100

    def test_rate_zero_keeps_none(self):
        assert not sample_mask(1000, 0.0, leaf_rng(0, 0)).any()

    @pytest.mark.parametrize("rate", [0.1, 0.5, 0.9])
    def test_expected_fraction(self, rate):
        m = sample_mask(200_000, rate, leaf_rng(1, 0))
        assert abs(m.mean() - rate) < 0.01

    def test_deterministic(self):
        a = sample_mask(50, 0.5, leaf_rng(3, 1))
        b = sample_mask(50, 0.5, leaf_rng(3, 1))
        assert np.array_equal(a, b)


class TestSerialization:
    def test_roundtrip(self):
        sk = MomentsSketch("x")
        s = sk.summarize(pd.DataFrame({"x": [1.0, 2.0, 3.0]}), leaf_rng(0, 0))
        back = sk.from_bytes(sk.to_bytes(s))
        assert back.count == s.count and back.min == s.min
        assert np.array_equal(back.power_sums, s.power_sums)

    def test_bytes_are_compact(self):
        sk = MomentsSketch("x")
        s = sk.summarize(
            pd.DataFrame({"x": np.arange(100_000, dtype="float64")}), leaf_rng(0, 0)
        )
        # Summary size must not scale with the data: 100k rows, <1 KB.
        assert len(sk.to_bytes(s)) < 1024


class TestCacheKey:
    def test_distinguishes_parameters(self):
        assert MomentsSketch("x").cache_key() != MomentsSketch("y").cache_key()
        assert (
            MomentsSketch("x", k_moments=2).cache_key()
            != MomentsSketch("x", k_moments=3).cache_key()
        )

    def test_stable_for_equal_configs(self):
        assert MomentsSketch("x").cache_key() == MomentsSketch("x").cache_key()
