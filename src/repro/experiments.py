"""Experiment harnesses for every table in the paper's evaluation (§7).

Each function reproduces one table's rows; ``jobs/`` scripts print them
and EXPERIMENTS.md records paper-vs-measured. The benchmarks/ directory
wraps the same kernels in pytest-benchmark for regeneration.

Scale note: the paper's testbed is 8×28-core servers and 130M–13B rows;
ours is one 16-core container, so row counts are scaled down ~1000×
(Flights-1x ≙ SF 0.1 ≙ 130k rows) and the comparisons are about *shape*
(who wins, by what factor, where crossovers fall), not absolute times.
"""
from __future__ import annotations

import ast
import time
from dataclasses import dataclass
from pathlib import Path

import numpy as np
import pandas as pd

from repro.baseline import database, sparksql
from repro.core.histogram import HistogramSamplingSketch, HistogramStreamingSketch
from repro.core.sketch import leaf_rng
from repro.engine.cache import ComputationCache
from repro.engine.table import HillviewTable
from repro.engine.tree import run_sketch
from repro.workload import Spreadsheet
from repro.workload.ops import COLD_SKIP, run_all
from repro.workload.questions import QuestionResult
from repro.workload.questions import run_all as run_questions

# ---------------------------------------------------------------------------
# T1 — §7.2.1 single-thread histogram microbenchmark
# ---------------------------------------------------------------------------

#: Paper's numbers (100M rows, one thread) for EXPERIMENTS.md diffs.
PAPER_SINGLE_THREAD_MS = {"streaming": 527, "sampling": 197, "database system": 5830}


def single_thread_data(n_rows: int, seed: int = 0) -> pd.DataFrame:
    """Numeric column shaped like a delay distribution."""
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {"x": (g.exponential(8.0, n_rows) - 5.0 + g.normal(0, 4, n_rows)).round(0)}
    )


def single_thread_table(
    pdf: pd.DataFrame, spark=None, buckets: int = 100, v_pixels: int = 200
) -> list[database.MicrobenchResult]:
    """One row per method: specialized streaming/sampling summarize on
    one thread vs general-purpose engines on the same data (§7.2.1).
    The vizketch tree is a single leaf directly under the root."""
    lo, hi = float(pdf["x"].min()), float(pdf["x"].max())
    out = []

    streaming = HistogramStreamingSketch("x", lo, hi, buckets)
    t0 = time.perf_counter()
    streaming.summarize(pdf, leaf_rng(0, 0))
    out.append(database.MicrobenchResult("streaming", (time.perf_counter() - t0) * 1000))

    sampling = HistogramSamplingSketch(
        "x", lo, hi, buckets, v_pixels=v_pixels, total_rows=len(pdf)
    )
    t0 = time.perf_counter()
    sampling.summarize(pdf, leaf_rng(0, 0))
    out.append(database.MicrobenchResult("sampling", (time.perf_counter() - t0) * 1000))

    out.append(database.duckdb_histogram(pdf, "x", lo, hi, buckets))
    if spark is not None:
        out.append(
            database.sparksql_histogram_single_thread(spark, pdf, "x", lo, hi, buckets)
        )
    return out


# ---------------------------------------------------------------------------
# T2/T3 — Fig. 5/6 end-to-end O1–O11, Hillview engine vs Spark SQL
# ---------------------------------------------------------------------------

#: Paper's Fig. 5 qualitative facts recorded in EXPERIMENTS.md.
PAPER_END_TO_END_NOTE = (
    "Hillview ≥ Spark on most ops at equal data; Spark ships ~10× more "
    "bytes except O11 (heat map), where Hillview's progressive partials "
    "accumulate the most bytes of any op"
)


@dataclass
class EndToEndRow:
    op: str
    system: str
    dataset: str
    wall_time_s: float
    first_partial_s: float | None
    root_bytes: int


def hillview_end_to_end(
    spark, sf: float, partitions: int = 64, seed: int = 0, label: str = ""
) -> list[EndToEndRow]:
    """Warm path: flights cached in memory, vizketch engine (Fig. 5)."""
    from repro.synth_data import flights

    df = flights(spark, sf=sf).repartition(partitions).persist()
    df.count()
    table = HillviewTable(spark, df=df, base_id=f"flights-{sf}")
    sheet = Spreadsheet(table, cache=ComputationCache(), seed=seed)
    rows = [
        EndToEndRow(
            r.name, "Hillview", label or f"sf={sf}", r.wall_time,
            r.first_partial_time, r.root_bytes,
        )
        for r in run_all(sheet)
    ]
    df.unpersist()
    return rows


def hillview_end_to_end_cold(
    spark, sf: float, parquet_dir: str, partitions: int = 64, seed: int = 0,
    label: str = "",
) -> list[EndToEndRow]:
    """Cold path (Fig. 6): data re-read from Parquet for every tree; the
    engine has no data cache, exactly the paper's cold-SSD setup. O4 and
    O6 are skipped as in the paper."""
    from repro.synth_data import flights

    path = str(Path(parquet_dir) / f"flights-{sf}")
    if not Path(path).exists():
        flights(spark, sf=sf).repartition(partitions).write.parquet(path)
    spark.catalog.clearCache()
    table = HillviewTable(spark, parquet_path=path, base_id=f"flights-cold-{sf}")
    sheet = Spreadsheet(table, cache=ComputationCache(), seed=seed)
    return [
        EndToEndRow(
            r.name, "Hillview-cold", label or f"sf={sf}", r.wall_time,
            r.first_partial_time, r.root_bytes,
        )
        for r in run_all(sheet, skip=COLD_SKIP)
    ]


def spark_end_to_end(
    spark, sf: float, partitions: int = 64, label: str = ""
) -> list[EndToEndRow]:
    """The general-purpose baseline on the same session and data."""
    from repro.synth_data import flights

    df = flights(spark, sf=sf).repartition(partitions).persist()
    df.count()
    rows = [
        EndToEndRow(
            r.name, "Spark", label or f"sf={sf}", r.wall_time, None, r.master_bytes
        )
        for r in sparksql.run_all(df)
    ]
    df.unpersist()
    return rows


# ---------------------------------------------------------------------------
# T4/T5 — Fig. 7/8 scalability sweeps
# ---------------------------------------------------------------------------


def _numeric_df(spark, n_rows: int, partitions: int):
    """Deterministic numeric column generated inside Spark (no driver
    materialization), shaped like [-30, 120) delays."""
    from pyspark.sql import functions as F

    return (
        spark.range(n_rows, numPartitions=partitions)
        .select(
            (
                (F.col("id") * F.lit(2654435761) % F.lit(2**31))
                / F.lit(2**31) * F.lit(150.0) - F.lit(30.0)
            ).alias("x")
        )
    )


@dataclass
class ScalabilityRow:
    n_leaves: int
    total_rows: int
    method: str
    wall_time_s: float


def thread_scalability(
    spark,
    rows_per_leaf: int = 400_000,
    leaf_counts: tuple[int, ...] = (1, 2, 4, 8, 16, 32),
    v_pixels: int = 200,
    buckets: int = 100,
) -> list[ScalabilityRow]:
    """Fig. 7: add leaves and shards together (constant rows/leaf).

    Ideal scalability is constant latency for the streaming vizketch;
    the sampled vizketch gets *faster* (super-linear) because its total
    sample size is fixed by the display, so per-leaf work shrinks."""
    out = []
    for n in leaf_counts:
        total = n * rows_per_leaf
        df = _numeric_df(spark, total, n).persist()
        df.count()
        table = HillviewTable(spark, df=df, base_id=f"scal-{n}")
        for method, sk, pre in _scal_methods(total, buckets, v_pixels):
            run_sketch(table, sk, presample_rate=pre)  # warm the path once
            t0 = time.perf_counter()
            run_sketch(table, sk, presample_rate=pre)
            out.append(
                ScalabilityRow(n, total, method, time.perf_counter() - t0)
            )
        df.unpersist()
    return out


def _scal_methods(total: int, buckets: int, v_pixels: int):
    """The two Fig. 7/8 vizketches. The sampled one applies its
    display-driven rate in the JVM (leaves sample while reading the
    chunk), so per-leaf work shrinks as leaves grow — the source of the
    paper's super-linear scalability."""
    from repro.core.histogram import histogram_sample_size

    streaming = HistogramStreamingSketch("x", -30, 120, buckets)
    rate = min(1.0, histogram_sample_size(v_pixels) / max(1, total))
    sampled = HistogramStreamingSketch("x", -30, 120, buckets)
    return [("streaming", streaming, None), ("sampling", sampled, rate)]


def server_scalability(
    spark,
    leaves_per_server: int = 8,
    server_counts: tuple[int, ...] = (1, 2, 4, 8),
    rows_per_leaf: int = 400_000,
    v_pixels: int = 200,
    buckets: int = 100,
) -> list[ScalabilityRow]:
    """Fig. 8: add simulated servers (leaf groups with an aggregation
    layer of one node per server, fanout = leaves/server). All
    "servers" share this machine's cores, so streaming latency holds
    constant only while total leaves <= cores — noted in EXPERIMENTS.md."""
    out = []
    for n in server_counts:
        leaves = n * leaves_per_server
        total = leaves * rows_per_leaf
        df = _numeric_df(spark, total, leaves).persist()
        df.count()
        table = HillviewTable(spark, df=df, base_id=f"srv-{n}")
        for method, sk, pre in _scal_methods(total, buckets, v_pixels):
            run_sketch(table, sk, fanout=leaves_per_server, presample_rate=pre)
            t0 = time.perf_counter()
            run_sketch(table, sk, fanout=leaves_per_server, presample_rate=pre)
            out.append(ScalabilityRow(n, total, method, time.perf_counter() - t0))
        df.unpersist()
    return out


# ---------------------------------------------------------------------------
# T6 — Fig. 9 lines of code per vizketch
# ---------------------------------------------------------------------------

#: Paper's Java LOC per vizketch (Fig. 9).
PAPER_LOC = {
    "Histogram": 114, "CDF": 114, "Stacked histogram": 130, "Heatmap": 130,
    "Heatmap trellis": 127, "Quantile": 79, "Next items": 191,
    "Find text": 108, "Heavy hitters (sampling)": 35, "Range": 156,
    "Number distinct": 117,
}

#: Our implementation: vizketch name -> (module, class names that
#: constitute it). LOC = class body lines, like the paper counts the
#: sketch classes.
LOC_MAP = {
    "Histogram": ("repro/core/histogram.py", ["HistogramStreamingSketch", "HistogramSamplingSketch"]),
    "CDF": ("repro/core/histogram.py", ["CDFSketch"]),
    "Stacked histogram": ("repro/core/stacked.py", ["StackedHistogramSketch"]),
    "Heatmap": ("repro/core/heatmap.py", ["HeatmapSketch"]),
    "Heatmap trellis": ("repro/core/heatmap.py", ["HeatmapTrellisSketch"]),
    "Quantile": ("repro/core/quantile.py", ["QuantileSketch"]),
    "Next items": ("repro/core/nextitems.py", ["NextItemsSketch", "SortOrder"]),
    "Find text": ("repro/core/nextitems.py", ["FindTextSketch"]),
    "Heavy hitters (sampling)": ("repro/core/heavy_hitters.py", ["SamplingHeavyHittersSketch"]),
    "Range": ("repro/core/moments.py", ["MomentsSketch"]),
    "Number distinct": ("repro/core/distinct.py", ["HyperLogLogSketch"]),
}


def _class_loc(path: Path, class_names: list[str]) -> int:
    tree = ast.parse(path.read_text())
    src_lines = path.read_text().splitlines()
    total = 0
    for node in ast.walk(tree):
        if isinstance(node, ast.ClassDef) and node.name in class_names:
            body = src_lines[node.lineno - 1 : node.end_lineno]
            total += sum(
                1 for ln in body if ln.strip() and not ln.strip().startswith("#")
            )
    return total


def loc_table(src_root: str | Path | None = None) -> dict[str, int]:
    root = Path(src_root) if src_root else Path(__file__).resolve().parents[1]
    return {
        name: _class_loc(root / mod, classes)
        for name, (mod, classes) in LOC_MAP.items()
    }


# ---------------------------------------------------------------------------
# T7 — Fig. 11 case study
# ---------------------------------------------------------------------------

#: Paper's Fig. 11 (actions, minutes:seconds of *human* time).
PAPER_CASE_STUDY = {
    "Q1": (5, "1:11"), "Q2": (3, "1:32"), "Q3": (4, "1:13"), "Q4": (5, "0:47*"),
    "Q5": (5, "2:26"), "Q6": (4, "2:15*"), "Q7": (2, "1:08"), "Q8": (5, "2:56"),
    "Q9": (1, "0:34"), "Q10": (1, "1:08*"), "Q11": (3, "1:18"), "Q12": (5, "6:44"),
    "Q13": (6, "6:27"), "Q14": (2, "0:20"), "Q15": (4, "1:56"), "Q16": (3, "1:07"),
    "Q17": (3, "1:07"), "Q18": (2, "1:08"), "Q19": (2, "0:40"), "Q20": (None, "2:23†"),
}


def case_study_table(spark, sf: float = 0.1, partitions: int = 32, seed: int = 0) -> list[QuestionResult]:
    from repro.synth_data import flights

    df = flights(spark, sf=sf).repartition(partitions).persist()
    df.count()
    table = HillviewTable(spark, df=df, base_id=f"flights-case-{sf}")
    sheet = Spreadsheet(table, cache=ComputationCache(), seed=seed)
    results = run_questions(sheet)
    df.unpersist()
    return results
