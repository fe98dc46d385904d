"""Heat map and trellis vizketches."""
import numpy as np
import pandas as pd
import pytest

from repro.core.buckets import CategoricalBucketer, NumericBucketer
from repro.core.heatmap import HeatmapSketch, HeatmapTrellisSketch, heatmap_sample_size
from repro.core.sketch import leaf_rng


@pytest.fixture(scope="module")
def heat():
    return HeatmapSketch(
        "dep_delay",
        "arr_delay",
        NumericBucketer(-30, 120, 20),
        NumericBucketer(-40, 130, 15),
    )


class TestHeatmap:
    def test_cells_match_histogram2d(self, fl_pdf, heat):
        s = heat.summarize(fl_pdf, leaf_rng(0, 0))
        sub = fl_pdf.dropna(subset=["dep_delay", "arr_delay"])
        x = sub["dep_delay"].to_numpy()
        y = sub["arr_delay"].to_numpy()
        keep = (x >= -30) & (x <= 120) & (y >= -40) & (y <= 130)
        expected, _, _ = np.histogram2d(
            x[keep], y[keep], bins=(20, 15), range=((-30, 120), (-40, 130))
        )
        assert np.array_equal(s.cells, expected.astype(np.int64))

    def test_mergeability(self, fl_pdf, fl_parts, heat):
        merged = heat.summarize_all(fl_parts)
        whole = heat.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.cells, whole.cells)

    def test_missing_needs_both_columns(self):
        pdf = pd.DataFrame({"x": [1.0, np.nan], "y": [np.nan, 2.0]})
        sk = HeatmapSketch(
            "x", "y", NumericBucketer(0, 10, 2), NumericBucketer(0, 10, 2)
        )
        s = sk.summarize(pdf, leaf_rng(0, 0))
        assert s.missing == 2 and s.cells.sum() == 0

    def test_render_color_range(self, fl_pdf, heat):
        s = heat.summarize(fl_pdf, leaf_rng(0, 0))
        colors = heat.render(s)
        assert colors.min() >= 0 and colors.max() <= heat.colors - 1
        # Empty cells get the background color 0; the densest cell the top.
        assert colors[np.unravel_index(s.cells.argmax(), s.cells.shape)] == heat.colors - 1

    def test_render_empty_is_background(self, heat):
        assert heat.render(heat.zero()).sum() == 0

    def test_sampled_error_within_shades(self, fl_pdf):
        sk = HeatmapSketch(
            "dep_delay",
            "arr_delay",
            NumericBucketer(-30, 120, 20),
            NumericBucketer(-40, 130, 15),
            total_rows=len(fl_pdf),
            sample=True,
        )
        exact = HeatmapSketch(
            "dep_delay",
            "arr_delay",
            NumericBucketer(-30, 120, 20),
            NumericBucketer(-40, 130, 15),
        )
        cs = sk.render(sk.summarize(fl_pdf, leaf_rng(2, 0)))
        ce = exact.render(exact.summarize(fl_pdf, leaf_rng(2, 0)))
        # One color shade of error w.h.p. (App. B.1); allow 2 for rounding.
        assert np.abs(cs - ce).max() <= 2

    def test_sample_size_display_driven(self):
        assert heatmap_sample_size(20, 10, 10) < heatmap_sample_size(20, 40, 40)


class TestTrellis:
    @pytest.fixture(scope="class")
    def trellis(self):
        return HeatmapTrellisSketch(
            "carrier",
            "dep_delay",
            "arr_delay",
            CategoricalBucketer(["WN", "DL", "AA"]),
            NumericBucketer(-30, 120, 8),
            NumericBucketer(-40, 130, 6),
        )

    def test_groups_match_filtered_heatmaps(self, fl_pdf, trellis):
        s = trellis.summarize(fl_pdf, leaf_rng(0, 0))
        for gi, carrier in enumerate(["WN", "DL", "AA"]):
            sub = fl_pdf[fl_pdf["carrier"] == carrier]
            inner = HeatmapSketch(
                "dep_delay",
                "arr_delay",
                NumericBucketer(-30, 120, 8),
                NumericBucketer(-40, 130, 6),
            ).summarize(sub, leaf_rng(0, 0))
            assert np.array_equal(s.groups[gi], inner.cells), carrier

    def test_mergeability(self, fl_pdf, fl_parts, trellis):
        merged = trellis.summarize_all(fl_parts)
        whole = trellis.summarize(fl_pdf, leaf_rng(0, 0))
        assert np.array_equal(merged.groups, whole.groups)

    def test_summary_size_matches_single_heatmap_budget(self, trellis):
        # k inner plots of shrunken resolution: total bins comparable to
        # one full-size heat map (App. B.1). Here 3*8*6 = 144 bins.
        z = trellis.zero()
        assert z.groups.size == 3 * 8 * 6
