"""T6 — Fig. 9 vizketch implementation effort.

Not a timing benchmark: asserts the LOC table regenerates and that
every vizketch stays compact (the paper's largest is 191 Java LOC; our
Python classes must stay in the same low-hundreds band). The actual
table is printed by jobs/loc_table.py.
"""
from repro.experiments import PAPER_LOC, loc_table


def test_loc_table_complete_and_compact(benchmark):
    ours = benchmark(loc_table)
    assert set(ours) == set(PAPER_LOC)
    for name, loc in ours.items():
        assert 0 < loc <= 250, f"{name} is {loc} LOC — not a compact vizketch"
