"""Execution-tree engine (§5.2–5.3): Spark leaves, merge tree, partials,
byte accounting, caching, cancellation — checked against DuckDB."""
import numpy as np
import pytest

from repro.core.heavy_hitters import MisraGriesSketch
from repro.core.histogram import HistogramStreamingSketch
from repro.core.moments import CountSketch, MomentsSketch
from repro.core.nextitems import NextItemsSketch, SortOrder
from repro.engine.cache import ComputationCache
from repro.engine.tree import run_local, run_sketch
from repro.oracle import assert_equivalent


class TestSparkVsLocal:
    """The Spark path must compute exactly what the local path computes
    for deterministic sketches — partitioning must not matter (App. A:
    f is a function on multisets)."""

    def test_moments_equal(self, fl_table, fl_parts):
        spark_res = run_sketch(fl_table, MomentsSketch("dep_delay"))
        local_res = run_local(fl_parts, MomentsSketch("dep_delay"))
        assert spark_res.value.count == local_res.value.count
        assert spark_res.value.min == local_res.value.min
        assert np.allclose(spark_res.value.power_sums, local_res.value.power_sums)

    def test_histogram_equal(self, fl_table, fl_parts):
        sk = HistogramStreamingSketch("dep_delay", -30, 120, 40)
        assert np.array_equal(
            run_sketch(fl_table, sk).value.counts,
            run_local(fl_parts, sk).value.counts,
        )

    def test_next_items_equal(self, fl_table, fl_parts):
        sk = NextItemsSketch(SortOrder.of("origin", ("dep_delay", False)), k=10)
        a = run_sketch(fl_table, sk).value
        b = run_local(fl_parts, sk).value
        assert a.rows == b.rows and a.counts == b.counts

    def test_misra_gries_equal_when_exact(self, fl_table, fl_parts):
        sk = MisraGriesSketch("carrier", k=100)
        a = run_sketch(fl_table, sk).value
        b = run_local(fl_parts, sk).value
        assert a.counters == b.counters


class TestOracle:
    def test_histogram_counts_vs_duckdb(self, spark, fl_table, fl_pdf):
        # Width 512 = 2^9: float binning and SQL FLOOR agree exactly.
        sk = HistogramStreamingSketch("distance", 0, 8192, 16)
        res = run_sketch(fl_table, sk)
        got = spark.createDataFrame(
            [(int(i), int(c)) for i, c in enumerate(res.value.counts) if c > 0],
            "bucket int, cnt bigint",
        )
        assert_equivalent(
            got,
            """
            SELECT CAST(LEAST(FLOOR(distance / 512.0), 15) AS INT) AS bucket,
                   COUNT(*) AS cnt
            FROM fl WHERE distance IS NOT NULL AND distance BETWEEN 0 AND 8192
            GROUP BY bucket
            """,
            fl=fl_pdf,
        )

    def test_carrier_counts_vs_duckdb(self, spark, fl_table, fl_pdf):
        sk = MisraGriesSketch("carrier", k=100)  # exact: k > distinct
        res = run_sketch(fl_table, sk)
        got = spark.createDataFrame(
            [(v, int(c)) for v, c in res.value.counters.items()],
            "carrier string, cnt bigint",
        )
        assert_equivalent(
            got,
            "SELECT carrier, COUNT(*) AS cnt FROM fl GROUP BY carrier",
            fl=fl_pdf,
        )

    def test_filtered_count_vs_duckdb(self, spark, fl_table, fl_pdf):
        sub = fl_table.filter("hi", lambda p: p["dest_state"] == "HI")
        res = run_sketch(sub, CountSketch())
        got = spark.createDataFrame([(res.value.rows,)], "cnt bigint")
        assert_equivalent(
            got,
            "SELECT COUNT(*) AS cnt FROM fl WHERE dest_state = 'HI'",
            fl=fl_pdf,
        )


class TestTreeMechanics:
    def test_leaves_equal_partitions(self, fl_table, fl_df):
        res = run_sketch(fl_table, CountSketch())
        assert res.n_leaves == fl_df.rdd.getNumPartitions()

    def test_partials_progress_monotonically(self, fl_table):
        res = run_sketch(fl_table, CountSketch(), fanout=2)
        counts = [p.rows for p in res.partials]
        assert counts == sorted(counts)
        assert counts[-1] == res.value.rows

    @pytest.mark.parametrize("fanout", [1, 2, 4, 8, 100])
    def test_fanout_does_not_change_result(self, fl_table, fanout):
        res = run_sketch(fl_table, MomentsSketch("dep_delay"), fanout=fanout)
        base = run_sketch(fl_table, MomentsSketch("dep_delay"), fanout=3)
        assert res.value.count == base.value.count
        assert np.allclose(res.value.power_sums, base.value.power_sums)

    def test_partial_count_tracks_fanout(self, fl_table):
        r2 = run_sketch(fl_table, CountSketch(), fanout=2)
        r8 = run_sketch(fl_table, CountSketch(), fanout=8)
        assert len(r2.partials) == int(np.ceil(r2.n_leaves / 2))
        assert len(r8.partials) == int(np.ceil(r8.n_leaves / 8))

    def test_root_bytes_positive_and_display_sized(self, fl_table):
        res = run_sketch(fl_table, HistogramStreamingSketch("dep_delay", -30, 120, 50))
        assert 0 < res.root_bytes < 100_000  # summaries, not data
        assert res.leaf_bytes > 0

    def test_timing_split(self, fl_table):
        res = run_sketch(fl_table, CountSketch())
        assert res.wall_time >= res.leaf_phase_time >= 0
        assert res.merge_phase_time >= 0


class TestCancellation:
    def test_cancel_processes_prefix(self, fl_table):
        res = run_sketch(fl_table, CountSketch(), cancel_after_leaves=3)
        assert res.cancelled and res.leaves_processed == 3
        full = run_sketch(fl_table, CountSketch())
        assert 0 < res.value.rows < full.value.rows

    def test_cancel_beyond_leaves_is_noop(self, fl_table):
        res = run_sketch(fl_table, CountSketch(), cancel_after_leaves=10_000)
        assert not res.cancelled


class TestEngineCache:
    def test_deterministic_sketch_cached(self, fl_table):
        cache = ComputationCache()
        r1 = run_sketch(fl_table, MomentsSketch("taxi_in"), cache=cache)
        r2 = run_sketch(fl_table, MomentsSketch("taxi_in"), cache=cache)
        assert not r1.from_cache and r2.from_cache
        assert r2.value.count == r1.value.count

    def test_cache_key_includes_table_version(self, fl_table):
        cache = ComputationCache()
        run_sketch(fl_table, MomentsSketch("taxi_in"), cache=cache)
        sub = fl_table.filter("f", lambda p: p["cancelled"] == 1)
        r = run_sketch(sub, MomentsSketch("taxi_in"), cache=cache)
        assert not r.from_cache  # different table -> recompute

    def test_cancelled_results_not_cached(self, fl_table):
        cache = ComputationCache()
        run_sketch(fl_table, CountSketch(), cache=cache, cancel_after_leaves=2)
        r = run_sketch(fl_table, CountSketch(), cache=cache)
        assert not r.from_cache


class TestDeterminism:
    def test_same_seed_same_sampled_result(self, fl_table):
        from repro.core.histogram import HistogramSamplingSketch

        sk = HistogramSamplingSketch(
            "dep_delay", -30, 120, 30, v_pixels=30, total_rows=13_000, c=1.0
        )
        a = run_sketch(fl_table, sk, seed=42)
        b = run_sketch(fl_table, sk, seed=42)
        assert np.array_equal(a.value.counts, b.value.counts)

    def test_different_seed_different_sample(self, fl_table):
        from repro.core.histogram import HistogramSamplingSketch

        sk = HistogramSamplingSketch(
            "dep_delay", -30, 120, 30, v_pixels=30, total_rows=13_000, c=1.0
        )
        a = run_sketch(fl_table, sk, seed=1)
        b = run_sketch(fl_table, sk, seed=2)
        assert not np.array_equal(a.value.counts, b.value.counts)


class TestDerivedTablesThroughEngine:
    def test_filter_then_sketch(self, fl_table, fl_pdf):
        sub = fl_table.filter("ua", lambda p: p["carrier"] == "UA")
        res = run_sketch(sub, CountSketch())
        assert res.value.rows == (fl_pdf["carrier"] == "UA").sum()

    def test_map_then_sketch(self, fl_table, fl_pdf):
        t = fl_table.with_column("total", lambda p: p["taxi_in"] + p["taxi_out"])
        res = run_sketch(t, MomentsSketch("total"))
        expected = (fl_pdf["taxi_in"] + fl_pdf["taxi_out"]).mean()
        assert abs(res.value.mean - expected) < 1e-9

    def test_membership_stats_surface(self, fl_table):
        sub = fl_table.filter(
            "rare", lambda p: (p["carrier"] == "HA") & (p["origin"] == "HNL")
        )
        res = run_sketch(sub, CountSketch())
        kinds = {s.membership_kind for s in res.leaf_stats}
        assert kinds <= {"SparseMembership", "DenseMembership"}
