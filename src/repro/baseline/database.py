"""Single-thread database baseline for the §7.2.1 microbenchmark.

The paper benchmarks a histogram on 100M rows, one thread, against "a
common high-end commercial in-memory database system" (unnamed; 5,830
ms vs 527 ms streaming / 197 ms sampling). Our stand-in is DuckDB — an
in-memory analytic database with the general-purpose machinery the
paper blames for the gap (full SQL surface, a planner, type-dispatched
execution) — pinned to one thread. We also report Spark SQL restricted
to one core when the caller provides a session, since Spark is the
other general-purpose engine in the paper's evaluation.

The vizketch side of the comparison is ``run_local`` over the same
in-memory data with a single leaf (one thread), exactly the paper's
setup ("a tree with a single leaf directly connected to the root").
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import duckdb
import pandas as pd


@dataclass
class MicrobenchResult:
    method: str
    millis: float


def duckdb_histogram(
    pdf: pd.DataFrame, column: str, x0: float, x1: float, buckets: int
) -> MicrobenchResult:
    """Histogram via SQL GROUP BY on a single DuckDB thread."""
    con = duckdb.connect()
    try:
        con.execute("SET threads=1")
        con.register("t", pdf)
        width = (x1 - x0) / buckets if x1 > x0 else 1.0
        t0 = time.perf_counter()
        con.execute(
            f"""
            SELECT LEAST(CAST(FLOOR(({column} - {x0}) / {width}) AS BIGINT),
                         {buckets - 1}) AS bucket,
                   COUNT(*) AS cnt
            FROM t
            WHERE {column} IS NOT NULL
              AND {column} >= {x0} AND {column} <= {x1}
            GROUP BY bucket ORDER BY bucket
            """
        ).fetchall()
        dt = time.perf_counter() - t0
    finally:
        con.close()
    return MicrobenchResult("database system (DuckDB, 1 thread)", dt * 1000)


def sparksql_histogram_single_thread(
    spark, pdf: pd.DataFrame, column: str, x0: float, x1: float, buckets: int
) -> MicrobenchResult:
    """Histogram through Catalyst with parallelism clamped to one task."""
    from pyspark.sql import functions as F

    df = spark.createDataFrame(pdf).coalesce(1).persist()
    df.count()  # materialize before timing, like the paper's warm runs
    width = (x1 - x0) / buckets if x1 > x0 else 1.0
    t0 = time.perf_counter()
    (
        df.where(F.col(column).isNotNull())
        .groupBy(
            F.least(
                F.floor((F.col(column) - F.lit(x0)) / F.lit(width)),
                F.lit(buckets - 1),
            ).alias("bucket")
        )
        .count()
        .collect()
    )
    dt = time.perf_counter() - t0
    df.unpersist()
    return MicrobenchResult("database system (Spark SQL, 1 task)", dt * 1000)
