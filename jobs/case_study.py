"""T7 (Fig. 10/11): case-study questions Q1–Q20 as scripted actions.

Usage: spark-submit jobs/case_study.py [sf]
Prints actions + machine time per question next to the paper's actions
and human (operator) time. Human time is not comparable to machine
time — the paper notes most of it is thinking, not waiting.
"""
import sys

from repro.experiments import PAPER_CASE_STUDY, case_study_table
from repro.session import get_session


def main(sf: float = 0.1) -> None:
    spark = get_session("case-study")
    results = case_study_table(spark, sf=sf)
    print(f"\n== T7: case study on flights sf={sf} (Fig. 11) ==")
    print(
        f"{'Q':4s} {'Acts':>4s} {'Paper':>5s} {'Machine(s)':>10s} "
        f"{'Paper human':>11s}  Answer"
    )
    for r in results:
        pa, pt = PAPER_CASE_STUDY[r.name]
        flag = "" if r.satisfactory else "*"
        print(
            f"{r.name:4s} {r.actions:4d} {str(pa) if pa else '—':>5s} "
            f"{r.machine_time:10.2f} {pt:>11s}  {r.answer[:70]}{flag}"
        )
    spark.stop()


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 0.1)
