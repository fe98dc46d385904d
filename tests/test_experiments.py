"""Experiment harnesses: each table generator produces well-formed rows."""
from repro import experiments as X


class TestSingleThread:
    def test_table_rows(self):
        pdf = X.single_thread_data(50_000)
        rows = X.single_thread_table(pdf)
        methods = [r.method for r in rows]
        assert methods[0] == "streaming" and methods[1] == "sampling"
        assert any("DuckDB" in m for m in methods)
        assert all(r.millis > 0 for r in rows)

    def test_data_deterministic(self):
        a = X.single_thread_data(10_000)
        b = X.single_thread_data(10_000)
        assert a.equals(b)

    def test_paper_constants_present(self):
        assert X.PAPER_SINGLE_THREAD_MS["database system"] == 5830


class TestLocTable:
    def test_matches_paper_vizketch_set(self):
        assert set(X.loc_table()) == set(X.PAPER_LOC)

    def test_all_compact(self):
        for name, loc in X.loc_table().items():
            assert 0 < loc <= 250, name

    def test_paper_largest_is_next_items(self):
        assert max(X.PAPER_LOC, key=X.PAPER_LOC.get) == "Next items"


class TestNumericDf:
    def test_row_count_and_partitions(self, spark):
        df = X._numeric_df(spark, 1000, 4)
        assert df.count() == 1000
        assert df.rdd.getNumPartitions() == 4

    def test_range(self, spark):
        import pandas as pd

        pdf = X._numeric_df(spark, 5000, 2).toPandas()
        assert pdf["x"].between(-30, 120).all()
        # Not degenerate: spreads over the range.
        assert pdf["x"].std() > 20


class TestEndToEndHarness:
    def test_warm_rows_structure(self, spark):
        rows = X.hillview_end_to_end(spark, sf=0.005, partitions=4, label="t")
        assert [r.op for r in rows] == [f"O{i}" for i in range(1, 12)]
        assert all(r.system == "Hillview" for r in rows)
        assert all(r.wall_time_s > 0 and r.root_bytes > 0 for r in rows)

    def test_spark_rows_structure(self, spark):
        rows = X.spark_end_to_end(spark, sf=0.005, partitions=4, label="t")
        assert [r.op for r in rows] == [f"O{i}" for i in range(1, 12)]
        assert all(r.first_partial_s is None for r in rows)

    def test_cold_rows_skip_o4_o6(self, spark, tmp_path):
        rows = X.hillview_end_to_end_cold(
            spark, 0.005, str(tmp_path), partitions=4, label="t"
        )
        ops = {r.op for r in rows}
        assert ops.isdisjoint({"O4", "O6"})
        assert len(ops) == 9


class TestScalabilityHarness:
    def test_thread_scalability_rows(self, spark):
        rows = X.thread_scalability(
            spark, rows_per_leaf=20_000, leaf_counts=(1, 2)
        )
        assert {(r.n_leaves, r.method) for r in rows} == {
            (1, "streaming"), (1, "sampling"), (2, "streaming"), (2, "sampling")
        }
        assert all(r.wall_time_s > 0 for r in rows)
        assert all(r.total_rows == r.n_leaves * 20_000 for r in rows)

    def test_server_scalability_rows(self, spark):
        rows = X.server_scalability(
            spark, server_counts=(1, 2), rows_per_leaf=10_000
        )
        assert {r.n_leaves for r in rows} == {1, 2}


class TestCaseStudyHarness:
    def test_all_questions_present(self, spark):
        rows = X.case_study_table(spark, sf=0.01, partitions=4)
        assert [r.name for r in rows] == [f"Q{i}" for i in range(1, 21)]
        assert set(X.PAPER_CASE_STUDY) == {r.name for r in rows}
