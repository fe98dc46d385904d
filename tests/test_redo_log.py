"""Redo log, soft state, and lazy replay (§5.7–5.8)."""
import numpy as np
import pytest

from repro.core.histogram import HistogramSamplingSketch
from repro.core.moments import CountSketch, MomentsSketch
from repro.engine.redo_log import MissingTableError, RootNode
from repro.engine.table import HillviewTable, TableOp
from repro.engine.tree import run_sketch


@pytest.fixture
def root(spark, fl_df):
    r = RootNode(spark)
    r.load_base(
        "flights", lambda: HillviewTable(spark, df=fl_df, base_id="flights")
    )
    return r


def cancelled_op():
    return TableOp("filter", "cancelled", lambda p: p["cancelled"] == 1)


class TestLog:
    def test_operations_logged_in_order(self, root):
        root.derive("flights", "flights/c", cancelled_op(), seed=7)
        kinds = [(e.kind, e.table_id) for e in root.log]
        assert kinds == [("load", "flights"), ("filter", "flights/c")]

    def test_seed_recorded(self, root):
        root.derive("flights", "flights/c", cancelled_op(), seed=123)
        assert root.log[-1].seed == 123


class TestReplay:
    def test_failure_then_lazy_replay(self, root, fl_pdf):
        root.derive("flights", "flights/c", cancelled_op())
        before = run_sketch(root.get_table("flights/c"), CountSketch())
        root.simulate_worker_failure()
        assert not root.is_live("flights/c")
        after = run_sketch(root.get_table("flights/c"), CountSketch())
        assert after.value.rows == before.value.rows == fl_pdf["cancelled"].sum()
        assert root.replays >= 1

    def test_replay_is_recursive_through_lineage(self, root):
        root.derive("flights", "flights/c", cancelled_op())
        root.derive(
            "flights/c",
            "flights/c/m",
            TableOp("map", "double", lambda p: p["dep_delay"] * 2),
        )
        root.simulate_worker_failure()
        t = root.get_table("flights/c/m")
        # Both ancestors were rebuilt on the way.
        assert root.is_live("flights") and root.is_live("flights/c")
        assert [op.name for op in t.ops] == ["cancelled", "double"]

    def test_replay_lazy_not_eager(self, root):
        root.derive("flights", "flights/c", cancelled_op())
        root.simulate_worker_failure()
        # Nothing is rebuilt until a table is actually referenced.
        assert root.replays == 0
        root.get_table("flights")
        assert root.replays == 1
        assert not root.is_live("flights/c")

    def test_unknown_table_errors(self, root):
        with pytest.raises(MissingTableError):
            root.get_table("nope")

    def test_failure_clears_computation_cache(self, root):
        run_sketch(root.get_table("flights"), MomentsSketch("taxi_in"), cache=root.cache)
        assert len(root.cache) == 1
        root.simulate_worker_failure()
        assert len(root.cache) == 0


class TestDeterministicReplay:
    def test_randomized_sketch_replays_bit_identically(self, root):
        """§5.8: the log stores seeds, so a replayed randomized vizketch
        matches what the surviving nodes computed."""
        sk = HistogramSamplingSketch(
            "dep_delay", -30, 120, 30, v_pixels=30, total_rows=13_000, c=1.0
        )
        seed = 77
        root.derive("flights", "flights/c", cancelled_op(), seed=seed)
        before = run_sketch(root.get_table("flights/c"), sk, seed=seed)
        root.simulate_worker_failure()
        logged_seed = next(
            e.seed for e in root.log if e.table_id == "flights/c"
        )
        after = run_sketch(root.get_table("flights/c"), sk, seed=logged_seed)
        assert np.array_equal(before.value.counts, after.value.counts)
