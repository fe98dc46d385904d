"""Property-based mergeability: summarize(D1 ⊎ D2) == merge(summarize(D1),
summarize(D2)) for every deterministic vizketch, under arbitrary splits
(App. A: the protocol must be oblivious to sharding)."""
import numpy as np
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bottomk import BottomKSketch
from repro.core.distinct import HyperLogLogSketch
from repro.core.heatmap import HeatmapSketch
from repro.core.heavy_hitters import MisraGriesSketch
from repro.core.histogram import HistogramStreamingSketch, StringHistogramSketch
from repro.core.moments import CountSketch, MomentsSketch
from repro.core.nextitems import NextItemsSketch, SortOrder
from repro.core.buckets import NumericBucketer
from repro.core.sketch import leaf_rng
from repro.core.stacked import StackedHistogramSketch


@st.composite
def frame_and_split(draw):
    n = draw(st.integers(min_value=0, max_value=120))
    xs = draw(
        st.lists(
            st.one_of(
                st.floats(-100, 100, allow_nan=False), st.just(np.nan)
            ),
            min_size=n,
            max_size=n,
        )
    )
    cats = draw(
        st.lists(st.sampled_from(["a", "b", "c", "dd", "ee"]), min_size=n, max_size=n)
    )
    split = draw(st.integers(min_value=0, max_value=n))
    pdf = pd.DataFrame({"x": xs, "s": cats})
    return pdf, split


def check(sk, pdf, split, eq):
    whole = sk.summarize(pdf, leaf_rng(0, 0))
    d1 = pdf.iloc[:split].reset_index(drop=True)
    d2 = pdf.iloc[split:].reset_index(drop=True)
    merged = sk.merge(
        sk.summarize(d1, leaf_rng(0, 0)), sk.summarize(d2, leaf_rng(0, 1))
    )
    eq(whole, merged)


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_histogram_mergeable(fs):
    pdf, split = fs
    sk = HistogramStreamingSketch("x", -100, 100, 13)
    check(sk, pdf, split, lambda a, b: (
        np.testing.assert_array_equal(a.counts, b.counts),
        np.testing.assert_equal(a.missing, b.missing),
    ))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_moments_mergeable(fs):
    pdf, split = fs
    sk = MomentsSketch("x", k_moments=3)
    def eq(a, b):
        assert a.count == b.count and a.missing == b.missing
        assert a.min == b.min and a.max == b.max
        np.testing.assert_allclose(a.power_sums, b.power_sums, rtol=1e-9)
    check(sk, pdf, split, eq)


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_count_mergeable(fs):
    pdf, split = fs
    check(CountSketch(), pdf, split, lambda a, b: np.testing.assert_equal(a.rows, b.rows))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_hll_mergeable(fs):
    pdf, split = fs
    sk = HyperLogLogSketch("s", p=8)
    check(sk, pdf, split, lambda a, b: np.testing.assert_array_equal(a.registers, b.registers))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_bottomk_mergeable(fs):
    pdf, split = fs
    sk = BottomKSketch("s", k=3)
    check(sk, pdf, split, lambda a, b: np.testing.assert_equal(a.entries, b.entries))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_string_histogram_mergeable(fs):
    pdf, split = fs
    sk = StringHistogramSketch("s", ["a", "c", "e"])
    check(sk, pdf, split, lambda a, b: np.testing.assert_array_equal(a.counts, b.counts))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_next_items_mergeable(fs):
    pdf, split = fs
    sk = NextItemsSketch(SortOrder.of("s", ("x", False)), k=5)
    def eq(a, b):
        assert a.rows == b.rows and a.counts == b.counts
    check(sk, pdf, split, eq)


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_stacked_mergeable(fs):
    pdf, split = fs
    from repro.core.buckets import CategoricalBucketer

    sk = StackedHistogramSketch(
        "x", "s", NumericBucketer(-100, 100, 7), CategoricalBucketer(["a", "b", "c"])
    )
    check(sk, pdf, split, lambda a, b: np.testing.assert_array_equal(a.cell_counts, b.cell_counts))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_heatmap_mergeable(fs):
    pdf, split = fs
    pdf = pdf.assign(y=pdf["x"] * 2)
    sk = HeatmapSketch(
        "x", "y", NumericBucketer(-100, 100, 5), NumericBucketer(-200, 200, 5)
    )
    check(sk, pdf, split, lambda a, b: np.testing.assert_array_equal(a.cells, b.cells))


@settings(max_examples=40, deadline=None)
@given(frame_and_split())
def test_misra_gries_merge_guarantee(fs):
    """MG merging is lossy but bounded: merged counters underestimate
    true counts by at most n/(k+1) and never overestimate."""
    pdf, split = fs
    k = 2
    sk = MisraGriesSketch("s", k=k)
    d1 = pdf.iloc[:split]
    d2 = pdf.iloc[split:]
    merged = sk.merge(
        sk.summarize(d1, leaf_rng(0, 0)), sk.summarize(d2, leaf_rng(0, 1))
    )
    truth = pdf["s"].value_counts()
    n = len(pdf)
    for v, c in merged.counters.items():
        assert c <= truth[v]
        assert c >= truth[v] - n / (k + 1) - 1e-9
