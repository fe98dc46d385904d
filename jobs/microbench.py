"""T1 (§7.2.1): single-thread histogram microbenchmark table.

Usage: spark-submit jobs/microbench.py [n_rows]
Prints the same rows as the paper's inline table (method, time ms).
"""
import sys

from repro.experiments import (
    PAPER_SINGLE_THREAD_MS,
    single_thread_data,
    single_thread_table,
)
from repro.session import get_session


def main(n_rows: int = 5_000_000) -> None:
    spark = get_session("microbench")
    pdf = single_thread_data(n_rows)
    # Warm run (JIT/numpy/duckdb caches), then the measured run — the
    # paper likewise discards the first measurement.
    single_thread_table(pdf.head(100_000), spark=None)
    rows = single_thread_table(pdf, spark=spark)
    print(f"\n== T1: single-thread histogram, {n_rows:,} rows ==")
    print(f"{'Method':44s} {'Time (ms)':>10s}  {'Paper (100M rows)':>18s}")
    for r in rows:
        key = next((k for k in PAPER_SINGLE_THREAD_MS if r.method.startswith(k)), None)
        paper = f"{PAPER_SINGLE_THREAD_MS[key]:,}" if key else "-"
        print(f"{r.method:44s} {r.millis:10.1f}  {paper:>18s}")
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 5_000_000)
