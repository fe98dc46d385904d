"""General-purpose Spark SQL baseline for O1–O11 (paper §7.1).

The paper's baseline is "a visualization front-end connected to a
general-purpose analytics back-end" — Spark, hand-optimized, measured
from computation start to query result at the master. We reproduce
that: each operation is the idiomatic Catalyst query a front-end such
as Tableau would issue for the same visualization, run on the same
session and data as the vizketch path. Differences from the vizketch
engine that this baseline deliberately keeps (they are the paper's
point about generality):

* exact computation — the engine has no display-error analysis, so it
  cannot sample safely;
* results at the engine's natural granularity — sorted pages carry all
  columns; chart aggregates are display-bucketed only when the
  front-end can supply buckets (it can, after a separate range query),
  mirroring the two-phase structure;
* no progressive results — the master sees data only at completion.

``master_bytes`` is the serialized size of every result the driver
receives (the analogue of Hillview's root bytes). The paper measured
NIC-level traffic, which also counts Spark's internal task chatter; our
accounting is therefore a lower bound for Spark — noted in
EXPERIMENTS.md.
"""
from __future__ import annotations

import pickle
import time
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass
class BaselineResult:
    name: str
    wall_time: float
    master_bytes: int
    rows_returned: int


def _collect(name: str, *dfs: DataFrame) -> BaselineResult:
    t0 = time.perf_counter()
    total_bytes = 0
    total_rows = 0
    for df in dfs:
        rows = df.collect()
        total_bytes += len(pickle.dumps([tuple(r) for r in rows], protocol=5))
        total_rows += len(rows)
    return BaselineResult(
        name=name,
        wall_time=time.perf_counter() - t0,
        master_bytes=total_bytes,
        rows_returned=total_rows,
    )


PAGE = 100  # rows per page a front-end fetches for a table view


def o1(df: DataFrame) -> BaselineResult:
    return _collect("O1", df.orderBy("dep_delay").limit(PAGE))


def o2(df: DataFrame) -> BaselineResult:
    return _collect(
        "O2",
        df.orderBy(
            "dep_delay", "arr_delay", "distance", "crs_dep_time", "taxi_out"
        ).limit(PAGE),
    )


def o3(df: DataFrame) -> BaselineResult:
    return _collect("O3", df.orderBy("origin").limit(PAGE))


def o4(df: DataFrame) -> BaselineResult:
    t0 = time.perf_counter()
    # Exact median via the general engine's percentile aggregate, then
    # the sorted page starting at it.
    med = df.select(F.expr("percentile(dep_delay, 0.5)").alias("m")).collect()
    page = (
        df.where(F.col("dep_delay") >= med[0].m)
        .orderBy("dep_delay", "arr_delay", "distance", "crs_dep_time", "taxi_out")
        .limit(PAGE)
        .collect()
    )
    payload = len(pickle.dumps([tuple(r) for r in page], protocol=5)) + len(
        pickle.dumps([tuple(r) for r in med], protocol=5)
    )
    return BaselineResult("O4", time.perf_counter() - t0, payload, len(page) + 1)


def _range_query(df: DataFrame, col: str) -> DataFrame:
    return df.select(
        F.min(col).alias("lo"), F.max(col).alias("hi"), F.count(col).alias("n")
    )


def _bucketed_counts(df: DataFrame, col: str, lo, hi, buckets: int) -> DataFrame:
    width = (hi - lo) / buckets if hi > lo else 1.0
    b = F.least(
        F.floor((F.col(col) - F.lit(lo)) / F.lit(width)), F.lit(buckets - 1)
    )
    return (
        df.where(F.col(col).isNotNull())
        .groupBy(b.alias("bucket"))
        .count()
        .orderBy("bucket")
    )


def o5(df: DataFrame, buckets: int = 50, h_pixels: int = 800) -> BaselineResult:
    t0 = time.perf_counter()
    rng = _range_query(df, "dep_delay").collect()
    lo, hi = rng[0].lo, rng[0].hi
    hist = _bucketed_counts(df, "dep_delay", lo, hi, buckets).collect()
    cdf = _bucketed_counts(df, "dep_delay", lo, hi, h_pixels).collect()
    payload = sum(
        len(pickle.dumps([tuple(r) for r in rows], protocol=5))
        for rows in (rng, hist, cdf)
    )
    return BaselineResult(
        "O5", time.perf_counter() - t0, payload, len(hist) + len(cdf) + 1
    )


def o6(df: DataFrame, buckets: int = 50, h_pixels: int = 800) -> BaselineResult:
    t0 = time.perf_counter()
    sub = df.where(F.col("dep_delay") < 60)
    rng = _range_query(sub, "dep_delay").collect()
    lo, hi = rng[0].lo, rng[0].hi
    hist = _bucketed_counts(sub, "dep_delay", lo, hi, buckets).collect()
    cdf = _bucketed_counts(sub, "dep_delay", lo, hi, h_pixels).collect()
    payload = sum(
        len(pickle.dumps([tuple(r) for r in rows], protocol=5))
        for rows in (rng, hist, cdf)
    )
    return BaselineResult(
        "O6", time.perf_counter() - t0, payload, len(hist) + len(cdf) + 1
    )


def o7(df: DataFrame) -> BaselineResult:
    # Display-unaware string histogram: per-distinct-value counts; the
    # front-end merges values into alphabetical buckets itself.
    return _collect("O7", df.groupBy("dest_city").count().orderBy("dest_city"))


def o8(df: DataFrame, k: int = 15) -> BaselineResult:
    return _collect(
        "O8",
        df.groupBy("carrier").count().orderBy(F.desc("count")).limit(k),
    )


def o9(df: DataFrame) -> BaselineResult:
    return _collect(
        "O9", df.select(F.countDistinct("flight_num").alias("distinct"))
    )


def o10(df: DataFrame, buckets: int = 50, colors: int = 20, h_pixels: int = 800) -> BaselineResult:
    t0 = time.perf_counter()
    xr = _range_query(df, "dep_delay").collect()
    yr = _range_query(df, "crs_dep_time").collect()
    xlo, xhi = xr[0].lo, xr[0].hi
    ylo, yhi = yr[0].lo, yr[0].hi
    xw = (xhi - xlo) / buckets if xhi > xlo else 1.0
    yw = (yhi - ylo) / colors if yhi > ylo else 1.0
    stacked = (
        df.where(F.col("dep_delay").isNotNull() & F.col("crs_dep_time").isNotNull())
        .groupBy(
            F.least(F.floor((F.col("dep_delay") - F.lit(xlo)) / F.lit(xw)), F.lit(buckets - 1)).alias("xb"),
            F.least(F.floor((F.col("crs_dep_time") - F.lit(ylo)) / F.lit(yw)), F.lit(colors - 1)).alias("yb"),
        )
        .count()
        .orderBy("xb", "yb")
        .collect()
    )
    cdf = _bucketed_counts(df, "dep_delay", xlo, xhi, h_pixels).collect()
    payload = sum(
        len(pickle.dumps([tuple(r) for r in rows], protocol=5))
        for rows in (xr, yr, stacked, cdf)
    )
    return BaselineResult(
        "O10", time.perf_counter() - t0, payload, len(stacked) + len(cdf) + 2
    )


def o11(df: DataFrame, bx: int = 266, by: int = 66) -> BaselineResult:
    t0 = time.perf_counter()
    xr = _range_query(df, "dep_delay").collect()
    yr = _range_query(df, "arr_delay").collect()
    xlo, xhi = xr[0].lo, xr[0].hi
    ylo, yhi = yr[0].lo, yr[0].hi
    xw = (xhi - xlo) / bx if xhi > xlo else 1.0
    yw = (yhi - ylo) / by if yhi > ylo else 1.0
    heat = (
        df.where(F.col("dep_delay").isNotNull() & F.col("arr_delay").isNotNull())
        .groupBy(
            F.least(F.floor((F.col("dep_delay") - F.lit(xlo)) / F.lit(xw)), F.lit(bx - 1)).alias("xb"),
            F.least(F.floor((F.col("arr_delay") - F.lit(ylo)) / F.lit(yw)), F.lit(by - 1)).alias("yb"),
        )
        .count()
        .collect()
    )
    payload = sum(
        len(pickle.dumps([tuple(r) for r in rows], protocol=5))
        for rows in (xr, yr, heat)
    )
    return BaselineResult(
        "O11", time.perf_counter() - t0, payload, len(heat) + 2
    )


ALL_OPS = {
    "O1": o1, "O2": o2, "O3": o3, "O4": o4, "O5": o5, "O6": o6,
    "O7": o7, "O8": o8, "O9": o9, "O10": o10, "O11": o11,
}


def run_all(df: DataFrame, skip: set[str] = frozenset()) -> list[BaselineResult]:
    return [fn(df) for name, fn in ALL_OPS.items() if name not in skip]
