"""T1 — §7.2.1 single-thread histogram microbenchmark.

Paper (100M rows, 1 thread): streaming 527 ms, sampling 197 ms,
database system 5,830 ms. Shape to reproduce at 2M rows: the
general-purpose engines are slower than the specialized streaming
summarize, and sampling beats streaming.

Regenerate: pytest benchmarks/bench_single_thread.py --benchmark-only
"""
import duckdb
import pytest

from repro.core.histogram import HistogramSamplingSketch, HistogramStreamingSketch
from repro.core.sketch import leaf_rng

BUCKETS = 100
V_PIXELS = 200


@pytest.fixture(scope="module")
def bounds(micro_pdf):
    return float(micro_pdf["x"].min()), float(micro_pdf["x"].max())


def test_streaming_vizketch(benchmark, micro_pdf, bounds):
    lo, hi = bounds
    sk = HistogramStreamingSketch("x", lo, hi, BUCKETS)
    benchmark(sk.summarize, micro_pdf, leaf_rng(0, 0))


def test_sampling_vizketch(benchmark, micro_pdf, bounds):
    lo, hi = bounds
    sk = HistogramSamplingSketch(
        "x", lo, hi, BUCKETS, v_pixels=V_PIXELS, total_rows=len(micro_pdf)
    )
    assert sk.rate < 1.0
    benchmark(sk.summarize, micro_pdf, leaf_rng(0, 0))


def test_database_system_duckdb(benchmark, micro_pdf, bounds):
    lo, hi = bounds
    width = (hi - lo) / BUCKETS
    con = duckdb.connect()
    con.execute("SET threads=1")
    con.register("t", micro_pdf)
    sql = (
        f"SELECT LEAST(CAST(FLOOR((x - {lo}) / {width}) AS BIGINT), {BUCKETS - 1}) b,"
        f" COUNT(*) FROM t WHERE x IS NOT NULL AND x >= {lo} AND x <= {hi}"
        " GROUP BY b ORDER BY b"
    )
    benchmark(lambda: con.execute(sql).fetchall())
    con.close()


def test_database_system_sparksql_one_task(benchmark, spark, micro_pdf, bounds):
    from pyspark.sql import functions as F

    lo, hi = bounds
    width = (hi - lo) / BUCKETS
    df = spark.createDataFrame(micro_pdf).coalesce(1).persist()
    df.count()
    q = (
        df.where(F.col("x").isNotNull())
        .groupBy(
            F.least(
                F.floor((F.col("x") - F.lit(lo)) / F.lit(width)),
                F.lit(BUCKETS - 1),
            ).alias("b")
        )
        .count()
    )
    benchmark.pedantic(q.collect, rounds=3, warmup_rounds=1)
    df.unpersist()
