"""Bottom-k distinct sketch and string bucket boundaries."""
import numpy as np
import pandas as pd

from repro.core.bottomk import (
    BottomK,
    BottomKSketch,
    stable_hash64,
    string_bucket_boundaries,
)
from repro.core.sketch import leaf_rng


class TestStableHash:
    def test_deterministic(self):
        assert stable_hash64("abc") == stable_hash64("abc")

    def test_seed_changes_hash(self):
        assert stable_hash64("abc", 0) != stable_hash64("abc", 1)

    def test_64_bit_range(self):
        h = stable_hash64("x")
        assert 0 <= h < 2**64


class TestBottomKSketch:
    def test_small_distinct_set_kept_exactly(self, fl_pdf, fl_parts):
        sk = BottomKSketch("origin", k=500)
        s = sk.summarize_all(fl_parts)
        assert set(s.entries) == set(fl_pdf["origin"].unique())

    def test_trims_to_k(self):
        pdf = pd.DataFrame({"s": [f"v{i}" for i in range(1000)]})
        sk = BottomKSketch("s", k=50)
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert len(s.entries) == 50

    def test_merge_equals_whole(self):
        pdf = pd.DataFrame({"s": [f"v{i}" for i in range(1000)]})
        parts = [pdf.iloc[i::3] for i in range(3)]
        sk = BottomKSketch("s", k=40)
        merged = sk.summarize_all(parts)
        whole = sk.summarize(pdf, leaf_rng(0, 0))
        # Hash order is global, so the bottom-k is partition-invariant.
        assert merged.entries == whole.entries

    def test_duplicates_do_not_change_sketch(self):
        a = pd.DataFrame({"s": ["x", "y", "z"]})
        b = pd.DataFrame({"s": ["x", "x", "x", "y", "y", "z"]})
        sk = BottomKSketch("s", k=10)
        assert (
            sk.summarize(a, leaf_rng(0, 0)).entries
            == sk.summarize(b, leaf_rng(0, 0)).entries
        )

    def test_missing_ignored(self):
        pdf = pd.DataFrame({"s": ["x", None]})
        s = BottomKSketch("s", k=10).summarize(pdf, leaf_rng(0, 0))
        assert set(s.entries) == {"x"}


class TestBoundaries:
    def test_small_set_one_bucket_per_value(self):
        s = BottomK(k=100, entries={v: stable_hash64(v) for v in ["b", "a", "c"]})
        assert string_bucket_boundaries(s, 50) == ["a", "b", "c"]

    def test_large_set_quantile_boundaries(self):
        values = [f"{i:04d}" for i in range(1000)]
        s = BottomK(k=2000, entries={v: stable_hash64(v) for v in values})
        bounds = string_bucket_boundaries(s, 10)
        assert len(bounds) == 10
        assert bounds == sorted(bounds)
        assert bounds[0] == "0000"

    def test_quantiles_approximately_even(self):
        """With many distinct values, the bottom-k sample's quantiles
        land near the true distinct-quantiles (App. B.1)."""
        values = [f"{i:05d}" for i in range(20_000)]
        pdf = pd.DataFrame({"s": values})
        sk = BottomKSketch("s", k=1000)
        s = sk.summarize(pdf, leaf_rng(0, 0))
        bounds = string_bucket_boundaries(s, 10)
        positions = np.array([int(b) for b in bounds]) / 20_000
        ideal = np.arange(10) / 10
        assert np.abs(positions - ideal).max() < 0.05

    def test_empty(self):
        assert string_bucket_boundaries(BottomK(k=5), 10) == [""]
