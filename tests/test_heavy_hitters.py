"""Heavy hitters: Misra–Gries guarantees and the Thm. 4 sampling variant."""
import pandas as pd
import pytest

from repro.core.heavy_hitters import (
    MisraGriesSketch,
    SamplingHeavyHittersSketch,
    hh_sample_size,
)
from repro.core.sketch import leaf_rng


@pytest.fixture(scope="module")
def zipf_parts(zipf_pdf):
    return [zipf_pdf.iloc[i::4].reset_index(drop=True) for i in range(4)]


class TestMisraGries:
    def test_counter_bound(self, zipf_parts):
        sk = MisraGriesSketch("k", k=10)
        s = sk.summarize_all(zipf_parts)
        assert len(s.counters) <= 10

    def test_underestimates_within_n_over_k(self, zipf_pdf, zipf_parts):
        """MG guarantee: true_count - N/(K+1) <= estimate <= true_count."""
        k = 20
        sk = MisraGriesSketch("k", k=k)
        s = sk.summarize_all(zipf_parts)
        truth = zipf_pdf["k"].value_counts()
        n = len(zipf_pdf)
        for v, c in s.counters.items():
            assert c <= truth[v]
            assert c >= truth[v] - n / (k + 1)

    def test_finds_all_true_heavy_hitters(self, zipf_pdf, zipf_parts):
        k = 10
        sk = MisraGriesSketch("k", k=k)
        s = sk.summarize_all(zipf_parts)
        truth = zipf_pdf["k"].value_counts()
        n = len(zipf_pdf)
        # Every element above 2N/(K+1) must survive merging with a
        # positive counter (paper's MG merge keeps the guarantee).
        for v, c in truth.items():
            if c > 2 * n / (k + 1):
                assert v in s.counters, v

    def test_top_element_correct(self, zipf_pdf, zipf_parts):
        sk = MisraGriesSketch("k", k=10)
        hh = sk.heavy_hitters(sk.summarize_all(zipf_parts))
        assert hh[0][0] == zipf_pdf["k"].value_counts().index[0]

    def test_merge_equals_whole_when_k_exceeds_distincts(self, fl_pdf, fl_parts):
        sk = MisraGriesSketch("carrier", k=100)  # > 13 distinct carriers
        merged = sk.summarize_all(fl_parts)
        whole = fl_pdf["carrier"].value_counts()
        assert merged.counters == {k: int(v) for k, v in whole.items()}

    def test_threshold_filters(self, zipf_parts):
        sk = MisraGriesSketch("k", k=10)
        s = sk.summarize_all(zipf_parts)
        all_items = sk.heavy_hitters(s, threshold=0.0)
        few = sk.heavy_hitters(s, threshold=0.2)
        assert len(few) <= len(all_items)

    def test_sorted_by_count_desc(self, zipf_parts):
        sk = MisraGriesSketch("k", k=10)
        hh = sk.heavy_hitters(sk.summarize_all(zipf_parts), threshold=0.0)
        counts = [c for _, c in hh]
        assert counts == sorted(counts, reverse=True)

    def test_k_must_be_positive(self):
        with pytest.raises(ValueError):
            MisraGriesSketch("c", k=0)


class TestSamplingHeavyHitters:
    def test_sample_size_formula(self):
        assert hh_sample_size(10) < hh_sample_size(100)

    def test_thm4_recall_and_precision(self, zipf_pdf, zipf_parts):
        """Returns everything above 1/K frequency, nothing below 1/4K."""
        k = 10
        sk = SamplingHeavyHittersSketch("k", k=k, total_rows=len(zipf_pdf))
        hh = dict(sk.heavy_hitters(sk.summarize_all(zipf_parts, seed=3)))
        truth = zipf_pdf["k"].value_counts(normalize=True)
        for v, f in truth.items():
            if f >= 1.0 / k:
                assert v in hh, f"missed heavy hitter {v} at freq {f:.3f}"
        for v in hh:
            assert truth[v] >= 1.0 / (4 * k), f"false positive {v}"

    def test_frequencies_approximate(self, zipf_pdf, zipf_parts):
        sk = SamplingHeavyHittersSketch("k", k=10, total_rows=len(zipf_pdf))
        hh = dict(sk.heavy_hitters(sk.summarize_all(zipf_parts, seed=1)))
        truth = zipf_pdf["k"].value_counts(normalize=True)
        for v, f in hh.items():
            assert abs(f - truth[v]) < 0.05

    def test_rate_capped_at_one(self):
        sk = SamplingHeavyHittersSketch("k", k=50, total_rows=10)
        assert sk.rate == 1.0

    def test_empty(self):
        sk = SamplingHeavyHittersSketch("k", k=10, total_rows=100)
        assert sk.heavy_hitters(sk.zero()) == []

    def test_merge_adds_counters(self):
        sk = SamplingHeavyHittersSketch("k", k=10, total_rows=4)
        a = sk.summarize(pd.DataFrame({"k": ["x", "y"]}), leaf_rng(0, 0))
        b = sk.summarize(pd.DataFrame({"k": ["x"]}), leaf_rng(0, 1))
        m = sk.merge(a, b)
        assert m.counters == {"x": 2, "y": 1}
