"""HillviewTable derivations (§5.6) at the leaf level (no Spark needed)."""
import numpy as np
import pandas as pd
import pytest

from repro.engine.table import TableOp, apply_ops


def filter_op(name, fn):
    return TableOp("filter", name, fn)


def map_op(name, fn):
    return TableOp("map", name, fn)


class TestApplyOps:
    def test_no_ops_identity(self, fl_pdf):
        out, stats = apply_ops((), fl_pdf)
        assert len(out) == len(fl_pdf)
        assert stats.member_rows == stats.base_rows == len(fl_pdf)
        assert stats.membership_kind == "DenseMembership"

    def test_single_filter(self, fl_pdf):
        out, stats = apply_ops(
            (filter_op("ua", lambda p: p["carrier"] == "UA"),), fl_pdf
        )
        assert (out["carrier"] == "UA").all()
        assert stats.member_rows == (fl_pdf["carrier"] == "UA").sum()

    def test_filters_conjoin(self, fl_pdf):
        ops = (
            filter_op("ua", lambda p: p["carrier"] == "UA"),
            filter_op("sfo", lambda p: p["origin"] == "SFO"),
        )
        out, _ = apply_ops(ops, fl_pdf)
        expected = fl_pdf[(fl_pdf["carrier"] == "UA") & (fl_pdf["origin"] == "SFO")]
        assert len(out) == len(expected)

    def test_sparse_membership_for_selective_filter(self, fl_pdf):
        ops = (
            filter_op(
                "rare",
                lambda p: (p["carrier"] == "HA") & (p["origin"] == "HNL") & (p["flight_num"] < 100),
            ),
        )
        _, stats = apply_ops(ops, fl_pdf)
        assert stats.membership_kind == "SparseMembership"

    def test_map_adds_column(self, fl_pdf):
        ops = (map_op("total_delay", lambda p: p["dep_delay"] + p["taxi_out"]),)
        out, _ = apply_ops(ops, fl_pdf)
        assert "total_delay" in out.columns
        expected = (fl_pdf["dep_delay"] + fl_pdf["taxi_out"]).dropna()
        assert np.allclose(out["total_delay"].dropna(), expected)

    def test_filter_can_reference_mapped_column(self, fl_pdf):
        ops = (
            map_op("ratio", lambda p: p["arr_delay"] / (p["distance"] + 1)),
            filter_op("big", lambda p: p["ratio"] > 0.05),
        )
        out, _ = apply_ops(ops, fl_pdf)
        assert (out["ratio"] > 0.05).all()

    def test_filter_nan_predicate_excludes(self):
        pdf = pd.DataFrame({"x": [1.0, np.nan, 3.0]})
        out, _ = apply_ops((filter_op("gt", lambda p: p["x"] > 0),), pdf)
        assert len(out) == 2  # NaN comparison -> excluded, not error

    def test_membership_bytes_reported(self, fl_pdf):
        _, stats = apply_ops(
            (filter_op("ua", lambda p: p["carrier"] == "UA"),), fl_pdf
        )
        assert stats.membership_bytes > 0


class TestHillviewTableApi:
    def test_version_id_tracks_lineage(self, fl_table):
        t2 = fl_table.filter("f1", lambda p: p["cancelled"] == 0)
        t3 = t2.with_column("m1", lambda p: p["dep_delay"] * 2)
        assert fl_table.version_id == "flights-0.01"
        assert t2.version_id == "flights-0.01|filter:f1"
        assert t3.version_id == "flights-0.01|filter:f1/map:m1"

    def test_derivation_does_not_mutate_parent(self, fl_table):
        n_ops = len(fl_table.ops)
        fl_table.filter("f", lambda p: p["cancelled"] == 0)
        assert len(fl_table.ops) == n_ops

    def test_requires_exactly_one_source(self, spark):
        from repro.engine.table import HillviewTable

        with pytest.raises(ValueError):
            HillviewTable(spark)

    def test_bad_op_kind_rejected(self):
        with pytest.raises(ValueError):
            TableOp("delete", "x", lambda p: p)
