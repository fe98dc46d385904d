"""T6 (Fig. 9): lines of code per vizketch, ours vs the paper's Java.

Usage: python jobs/loc_table.py
"""
from repro.experiments import PAPER_LOC, loc_table


def main() -> None:
    ours = loc_table()
    print("\n== T6: vizketch implementation effort (Fig. 9) ==")
    print(f"{'Vizketch':28s} {'Ours (py LOC)':>13s} {'Paper (Java LOC)':>17s}")
    for name, paper in PAPER_LOC.items():
        print(f"{name:28s} {ours[name]:13d} {paper:17d}")


if __name__ == "__main__":
    main()
