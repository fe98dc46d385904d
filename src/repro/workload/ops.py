"""The Fig. 4 spreadsheet operations O1–O11 over the flights table.

Each operation is one user action in the spreadsheet, realized as the
vizketch trees of Fig. 14 through the :class:`Spreadsheet` facade. The
``+`` in the paper's descriptions means serial trees, ``&`` concurrent
trees of the same action (we run them serially on the shared session;
their times add, matching how the paper reports one response time per
action). Each function returns the facade's :class:`ActionMetrics`.

Column choices mirror the paper's dataset semantics: numerical sorts
use delay/time columns, string operations use airport/carrier columns.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.workload.sheet import ActionMetrics, Spreadsheet


@dataclass
class OpResult:
    name: str
    description: str
    wall_time: float
    root_bytes: int
    first_partial_time: float
    trees: int


def _result(name: str, description: str, *metrics: ActionMetrics) -> OpResult:
    return OpResult(
        name=name,
        description=description,
        wall_time=sum(m.wall_time for m in metrics),
        root_bytes=sum(m.root_bytes for m in metrics),
        first_partial_time=metrics[0].first_partial_time,
        trees=sum(m.trees for m in metrics),
    )


def o1(sheet: Spreadsheet) -> OpResult:
    """Sort, numerical data."""
    _, m = sheet.sort_view("dep_delay")
    return _result("O1", "Sort, numerical data", m)


def o2(sheet: Spreadsheet) -> OpResult:
    """Sort 5 columns, numerical data."""
    _, m = sheet.sort_view(
        "dep_delay", "arr_delay", "distance", "crs_dep_time", "taxi_out"
    )
    return _result("O2", "Sort 5 columns, numerical data", m)


def o3(sheet: Spreadsheet) -> OpResult:
    """Sort, string data."""
    _, m = sheet.sort_view("origin")
    return _result("O3", "Sort, string data", m)


def o4(sheet: Spreadsheet) -> OpResult:
    """Quantile + sort, 5 columns, numerical data (scroll bar move)."""
    _, m = sheet.scroll_to("dep_delay", 0.5)
    _, m2 = sheet.sort_view(
        "dep_delay", "arr_delay", "distance", "crs_dep_time", "taxi_out"
    )
    return _result("O4", "Quantile + sort, 5 columns, numerical data", m, m2)


def o5(sheet: Spreadsheet) -> OpResult:
    """Range + (histogram & cdf), numerical data."""
    _, m = sheet.histogram("dep_delay", sample=True, with_cdf=True)
    return _result("O5", "Range + (histogram & cdf), numerical data", m)


def o6(sheet: Spreadsheet) -> OpResult:
    """Filter + range + (histogram & cdf), numerical data (zoom-in)."""
    zoomed = sheet.filtered(
        "dep_delay<60", lambda pdf: pdf["dep_delay"] < 60
    )
    _, m = zoomed.histogram("dep_delay", sample=True, with_cdf=True)
    return _result("O6", "Filter + range + (histogram & cdf), numerical", m)


def o7(sheet: Spreadsheet) -> OpResult:
    """Distinct + range + histogram, string data."""
    _, m = sheet.string_histogram("dest_city")
    return _result("O7", "Distinct + range + histogram, string data", m)


def o8(sheet: Spreadsheet) -> OpResult:
    """Heavy hitters sampling, string data."""
    _, m = sheet.heavy_hitters("carrier", k=15, method="sampling")
    return _result("O8", "Heavy hitters sampling, string data", m)


def o9(sheet: Spreadsheet) -> OpResult:
    """Distinct count, numerical data."""
    _, m = sheet.distinct_count("flight_num")
    return _result("O9", "Distinct count, numerical data", m)


def o10(sheet: Spreadsheet) -> OpResult:
    """Range + (stacked histogram & cdf), numerical data."""
    _, m = sheet.stacked_histogram("dep_delay", "crs_dep_time", with_cdf=True)
    return _result("O10", "Range + (stacked histogram & cdf), numerical", m)


def o11(sheet: Spreadsheet) -> OpResult:
    """Heatmap, numerical data."""
    _, m = sheet.heatmap("dep_delay", "arr_delay")
    return _result("O11", "Heatmap, numerical data", m)


ALL_OPS = {
    "O1": o1, "O2": o2, "O3": o3, "O4": o4, "O5": o5, "O6": o6,
    "O7": o7, "O8": o8, "O9": o9, "O10": o10, "O11": o11,
}

#: Operations the paper omits in the cold-data run (Fig. 6): a prior
#: action has always loaded the data before these can occur.
COLD_SKIP = {"O4", "O6"}


def run_all(sheet: Spreadsheet, skip: set[str] = frozenset()) -> list[OpResult]:
    return [fn(sheet) for name, fn in ALL_OPS.items() if name not in skip]
