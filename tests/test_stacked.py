"""Stacked / normalized stacked histogram vizketch."""
import numpy as np
import pandas as pd
import pytest

from repro.core.buckets import CategoricalBucketer, NumericBucketer
from repro.core.sketch import leaf_rng
from repro.core.stacked import StackedHistogramSketch


@pytest.fixture(scope="module")
def sketch():
    return StackedHistogramSketch(
        "dep_delay",
        "carrier",
        NumericBucketer(-30, 120, 10),
        CategoricalBucketer(["WN", "DL", "AA", "UA"]),
        v_pixels=100,
    )


class TestExactStacked:
    def test_cells_match_pandas_crosstab(self, fl_pdf, sketch):
        s = sketch.summarize(fl_pdf, leaf_rng(0, 0))
        sub = fl_pdf.dropna(subset=["dep_delay", "carrier"])
        sub = sub[sub["carrier"].isin(["WN", "DL", "AA", "UA"])]
        sub = sub[(sub["dep_delay"] >= -30) & (sub["dep_delay"] <= 120)]
        xb = np.minimum(((sub["dep_delay"] + 30) / 15).astype(int), 9)
        expected = (
            pd.crosstab(xb, sub["carrier"])
            .reindex(index=range(10), columns=["WN", "DL", "AA", "UA"])
            .fillna(0)
            .to_numpy()
        )
        assert np.array_equal(s.cell_counts, expected)

    def test_bars_are_cell_row_sums(self, fl_pdf, sketch):
        s = sketch.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(s.bar_counts, s.cell_counts.sum(axis=1))

    def test_mergeability(self, fl_pdf, fl_parts, sketch):
        merged = sketch.summarize_all(fl_parts)
        whole = sketch.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.cell_counts, whole.cell_counts)
        assert merged.missing == whole.missing

    def test_row_counts_only_if_both_columns_present(self):
        pdf = pd.DataFrame(
            {"x": [1.0, np.nan, 3.0], "y": ["a", "a", None]}
        )
        sk = StackedHistogramSketch(
            "x", "y", NumericBucketer(0, 10, 2), CategoricalBucketer(["a"])
        )
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert s.cell_counts.sum() == 1 and s.missing == 2


class TestRender:
    def test_normalized_bars_fill_height(self, fl_pdf, sketch):
        s = sketch.summarize(fl_pdf, leaf_rng(0, 0))
        px = sketch.render(s, normalized=True)
        nonzero = s.bar_counts > 0
        # Subdivisions of each non-empty bar sum to ~the full height
        # (rounding each subdivision independently costs a few pixels).
        assert np.all(np.abs(px[nonzero].sum(axis=1) - sketch.v_pixels) <= 2)

    def test_unnormalized_tallest_bar_hits_v(self, fl_pdf, sketch):
        s = sketch.summarize(fl_pdf, leaf_rng(0, 0))
        px = sketch.render(s, normalized=False)
        assert abs(px.sum(axis=1).max() - sketch.v_pixels) <= 2

    def test_empty_renders_zero(self, sketch):
        px = sketch.render(sketch.zero())
        assert px.sum() == 0


class TestSampledStacked:
    def test_rate_below_one_and_close_estimates(self, fl_pdf):
        sk = StackedHistogramSketch(
            "dep_delay",
            "carrier",
            NumericBucketer(-30, 120, 10),
            CategoricalBucketer(["WN", "DL", "AA", "UA"]),
            v_pixels=25,
            total_rows=len(fl_pdf),
            sample=True,
            c=1.0,
        )
        assert sk.rate < 1.0 and not sk.deterministic
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        exact = StackedHistogramSketch(
            "dep_delay",
            "carrier",
            NumericBucketer(-30, 120, 10),
            CategoricalBucketer(["WN", "DL", "AA", "UA"]),
        ).summarize(fl_pdf, leaf_rng(0, 0))
        scale = s.rows_scanned / max(1, s.rows_sampled)
        est = s.bar_counts * scale
        rel = np.abs(est - exact.bar_counts).max() / exact.bar_counts.max()
        assert rel < 0.15
