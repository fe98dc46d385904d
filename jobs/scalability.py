"""T4/T5 (Fig. 7/8): vizketch scalability over leaves and simulated servers.

Usage: spark-submit jobs/scalability.py [rows_per_leaf]
Ideal scalability = constant latency as leaves/servers and data grow
together; the sampled vizketch should get *faster* (super-linear).
"""
import sys

from repro.experiments import server_scalability, thread_scalability
from repro.session import get_session


def print_rows(rows, unit: str) -> None:
    print(f"{unit:>8s} {'Rows':>12s} {'Method':>10s} {'Time (s)':>9s}")
    for r in rows:
        print(
            f"{r.n_leaves:8d} {r.total_rows:12,d} {r.method:>10s} {r.wall_time_s:9.3f}"
        )


def main(rows_per_leaf: int = 400_000) -> None:
    spark = get_session("scalability")
    print("\n== T4: leaf/thread scalability (Fig. 7) ==")
    print_rows(thread_scalability(spark, rows_per_leaf=rows_per_leaf), "Leaves")
    print("\n== T5: simulated-server scalability (Fig. 8; 8 leaves/server) ==")
    print_rows(
        server_scalability(spark, rows_per_leaf=rows_per_leaf), "Servers"
    )
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 400_000)
