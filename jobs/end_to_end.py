"""T2/T3 (Fig. 5/6): end-to-end O1–O11, Hillview engine vs Spark SQL.

Usage: spark-submit jobs/end_to_end.py [--cold] [sf ...]
Default scale factors 0.1 and 0.5 (≙ the paper's 1x and 5x at 1/1000
row scale). Prints response time, modeled time-to-first-partial, and
bytes received by the root/master — the two Fig. 5 graphs as a table;
--cold adds the Fig. 6 rows (data re-read from Parquet each query).
"""
import sys
import tempfile

from repro.experiments import (
    PAPER_END_TO_END_NOTE,
    hillview_end_to_end,
    hillview_end_to_end_cold,
    spark_end_to_end,
)
from repro.session import get_session


def print_rows(rows) -> None:
    print(
        f"{'Op':5s} {'System':14s} {'Data':10s} {'Time (s)':>9s} "
        f"{'First (s)':>10s} {'Root bytes':>11s}"
    )
    for r in rows:
        first = f"{r.first_partial_s:.2f}" if r.first_partial_s is not None else "-"
        print(
            f"{r.op:5s} {r.system:14s} {r.dataset:10s} {r.wall_time_s:9.2f} "
            f"{first:>10s} {r.root_bytes:11,d}"
        )


def main(argv: list[str]) -> None:
    cold = "--cold" in argv
    sfs = [float(a) for a in argv if not a.startswith("--")] or [0.1, 0.5]
    spark = get_session("end-to-end")
    print(f"\n== T2: warm end-to-end (Fig. 5). Paper shape: {PAPER_END_TO_END_NOTE} ==")
    rows = []
    for sf in sfs:
        label = f"{sf/0.1:g}x"
        rows += hillview_end_to_end(spark, sf, label=label)
        rows += spark_end_to_end(spark, sf, label=label)
    print_rows(rows)
    if cold:
        print("\n== T3: cold end-to-end (Fig. 6; O4/O6 omitted as in the paper) ==")
        with tempfile.TemporaryDirectory() as d:
            cold_rows = []
            for sf in sfs:
                cold_rows += hillview_end_to_end_cold(
                    spark, sf, d, label=f"{sf/0.1:g}x"
                )
            print_rows(cold_rows)
    spark.stop()


if __name__ == "__main__":
    main(sys.argv[1:])
