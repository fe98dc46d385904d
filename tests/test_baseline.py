"""Spark SQL baseline (§7.1) and database baseline (§7.2.1) sanity +
oracle checks — the comparison is only fair if both sides are correct."""
import numpy as np
import pytest

from repro.baseline import database, sparksql
from repro.oracle import assert_equivalent


class TestSparkSqlBaseline:
    @pytest.mark.parametrize("name", list(sparksql.ALL_OPS))
    def test_op_runs(self, fl_df, name):
        r = sparksql.ALL_OPS[name](fl_df)
        assert r.name == name
        assert r.wall_time > 0
        assert r.master_bytes > 0
        assert r.rows_returned >= 1

    def test_o8_matches_oracle(self, spark, fl_df, fl_pdf):
        from pyspark.sql import functions as F

        got = (
            fl_df.groupBy("carrier")
            .agg(F.count("*").alias("cnt"))
            .orderBy(F.desc("cnt"))
            .limit(5)
        )
        assert_equivalent(
            got,
            """
            SELECT carrier, COUNT(*) AS cnt FROM fl
            GROUP BY carrier ORDER BY cnt DESC LIMIT 5
            """,
            fl=fl_pdf,
        )

    def test_o9_exact_distinct(self, fl_df, fl_pdf):
        r = sparksql.o9(fl_df)
        assert r.rows_returned == 1

    def test_heatmap_result_is_data_sized(self, fl_df):
        """The general engine's heat-map result scales with occupied
        cells, not with what a screen can show — the paper's point."""
        r = sparksql.o11(fl_df)
        assert r.rows_returned > 500


class TestDatabaseBaseline:
    def test_duckdb_histogram_runs(self, fl_pdf):
        r = database.duckdb_histogram(fl_pdf, "dep_delay", -30, 120, 50)
        assert r.millis > 0
        assert "DuckDB" in r.method

    def test_duckdb_agrees_with_streaming_sketch(self, fl_pdf):
        import duckdb

        from repro.core.histogram import HistogramStreamingSketch
        from repro.core.sketch import leaf_rng

        # Power-of-two bucket width (2.0) so the sketch's float binning
        # and SQL's FLOOR division agree exactly on integer delays.
        sk = HistogramStreamingSketch("dep_delay", -32, 96, 64)
        s = sk.summarize(fl_pdf, leaf_rng(0, 0))
        con = duckdb.connect()
        con.register("fl", fl_pdf)
        rows = con.execute(
            """
            SELECT LEAST(CAST(FLOOR((dep_delay + 32) / 2.0) AS BIGINT), 63) AS b,
                   COUNT(*) FROM fl
            WHERE dep_delay IS NOT NULL AND dep_delay BETWEEN -32 AND 96
            GROUP BY b ORDER BY b
            """
        ).fetchall()
        con.close()
        expected = np.zeros(64, dtype=np.int64)
        for b, c in rows:
            expected[int(b)] = c
        assert np.array_equal(s.counts, expected)

    def test_sparksql_single_thread_runs(self, spark, fl_pdf):
        r = database.sparksql_histogram_single_thread(
            spark, fl_pdf.head(2000), "dep_delay", -30, 120, 20
        )
        assert r.millis > 0
