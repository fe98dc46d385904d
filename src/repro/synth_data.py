"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Synthetic US airline on-time performance data (Hillview §7 "Dataset").
#
# The paper evaluates on the DOT on-time dataset: 130M rows, 110 columns,
# numerical + categorical + text + missing values, scaled by replication
# ("Flights-Kx"). We cannot ship that data, so this generator produces a
# deterministic synthetic equivalent with 24 semantically matching columns
# and planted structure so every case-study question (Fig. 10) has a real
# answer: per-carrier delay/cancellation profiles, hour-of-day delay
# growth, weather-delay cities, Hawaii routes, carriers that stop flying
# mid-period, and route frequencies (SFO/JFK/EWR/LAX/ORD/SJC...).
# ---------------------------------------------------------------------------

_N_FLIGHTS_PER_SF = 1_300_000  # sf=0.1 ~ 130k rows, mirroring Flights-1x/1000

#: (code, city, state). Includes the airports named in Fig. 10.
AIRPORTS = [
    ("ATL", "Atlanta", "GA"), ("ORD", "Chicago", "IL"),
    ("DFW", "Dallas", "TX"), ("DEN", "Denver", "CO"),
    ("LAX", "Los Angeles", "CA"), ("SFO", "San Francisco", "CA"),
    ("SJC", "San Jose", "CA"), ("OAK", "Oakland", "CA"),
    ("JFK", "New York", "NY"), ("EWR", "Newark", "NJ"),
    ("LGA", "New York", "NY"), ("BOS", "Boston", "MA"),
    ("SEA", "Seattle", "WA"), ("PHX", "Phoenix", "AZ"),
    ("IAH", "Houston", "TX"), ("MIA", "Miami", "FL"),
    ("MCO", "Orlando", "FL"), ("MSP", "Minneapolis", "MN"),
    ("DTW", "Detroit", "MI"), ("PHL", "Philadelphia", "PA"),
    ("CLT", "Charlotte", "NC"), ("SLC", "Salt Lake City", "UT"),
    ("BWI", "Baltimore", "MD"), ("SAN", "San Diego", "CA"),
    ("TPA", "Tampa", "FL"), ("PDX", "Portland", "OR"),
    ("STL", "St. Louis", "MO"), ("HNL", "Honolulu", "HI"),
    ("OGG", "Kahului", "HI"), ("LIH", "Lihue", "HI"),
    ("KOA", "Kona", "HI"), ("ANC", "Anchorage", "AK"),
]

#: (carrier code, share weight, mean delay minutes, cancel prob,
#:  active-until fraction of the period: <1.0 means the airline stops
#:  flying partway through — Q19's "airlines stopped flying").
CARRIERS = [
    ("WN", 20, 9.0, 0.010, 1.0),
    ("DL", 15, 6.0, 0.008, 1.0),
    ("AA", 14, 11.0, 0.018, 1.0),
    ("UA", 12, 13.0, 0.015, 1.0),
    ("OO", 8, 10.0, 0.020, 1.0),
    ("B6", 6, 12.0, 0.012, 1.0),
    ("AS", 5, 5.0, 0.006, 1.0),
    ("EV", 5, 14.0, 0.030, 1.0),
    ("MQ", 5, 12.0, 0.028, 1.0),
    ("HA", 3, 2.0, 0.003, 1.0),
    ("US", 4, 8.0, 0.012, 0.55),   # merged away mid-period
    ("VX", 2, 7.0, 0.008, 0.70),   # acquired mid-period
    ("NW", 1, 9.0, 0.015, 0.25),   # stopped early in the period
]

#: Cities with elevated weather delays (Q13).
_BAD_WEATHER_CITIES = {"Chicago": 9.0, "Denver": 7.0, "Boston": 6.0, "Detroit": 5.0}
_GOOD_WEATHER_CITIES = {"Phoenix": 0.2, "San Diego": 0.3, "Honolulu": 0.1, "Kona": 0.1}


def flights(spark: SparkSession, *, sf: float = 0.01, seed: int = 7) -> DataFrame:
    """Synthetic airline on-time dataset at scale factor ``sf``."""
    return spark.createDataFrame(flights_pdf(sf=sf, seed=seed))


def flights_pdf(*, sf: float = 0.01, seed: int = 7) -> pd.DataFrame:
    """The pandas form, for DuckDB oracles and local (no-Spark) leaves."""
    n = max(1, int(_N_FLIGHTS_PER_SF * sf))
    g = _rng(seed)
    period_days = 730  # two years

    codes = np.array([c for c, *_ in CARRIERS])
    weights = np.array([w for _, w, *_ in CARRIERS], dtype="float64")
    mean_delay = np.array([d for *_, d, _, _ in CARRIERS])
    cancel_p = np.array([p for *_, p, _ in CARRIERS])
    active_until = np.array([a for *_, a in CARRIERS])
    weights = weights / weights.sum()

    ci = g.choice(len(codes), size=n, p=weights)
    # Flight date: uniform over the period, but clipped to each
    # carrier's active window so defunct carriers vanish mid-period.
    day = (g.random(n) * active_until[ci] * period_days).astype(int)
    date = pd.to_datetime("2017-01-01") + pd.to_timedelta(day, unit="D")

    apt = np.array([a[0] for a in AIRPORTS])
    city = np.array([a[1] for a in AIRPORTS])
    state = np.array([a[2] for a in AIRPORTS])
    # Route matrix: heavy hubs more likely; HA mostly flies Hawaii.
    apt_w = g.random(len(apt)) + np.linspace(2.0, 0.2, len(apt))
    apt_w /= apt_w.sum()
    oi = g.choice(len(apt), size=n, p=apt_w)
    di = g.choice(len(apt), size=n, p=apt_w)
    same = oi == di
    di[same] = (oi[same] + 1 + (g.integers(0, len(apt) - 1, same.sum()))) % len(apt)
    hawaii = np.array([s == "HI" for s in state])
    ha_rows = codes[ci] == "HA"
    # Route most HA flights through a Hawaiian endpoint.
    hi_idx = np.flatnonzero(hawaii)
    repl = g.choice(hi_idx, size=int(ha_rows.sum()))
    oi[ha_rows] = np.where(g.random(ha_rows.sum()) < 0.5, repl, oi[ha_rows])
    di[ha_rows] = np.where(g.random(ha_rows.sum()) < 0.8, g.choice(hi_idx, size=int(ha_rows.sum())), di[ha_rows])
    # Keep long-haul-only carriers out of Hawaii for contrast (Q14):
    # regional EV/MQ/OO never fly there.
    regional = np.isin(codes[ci], ["EV", "MQ", "OO"])
    bad = regional & (hawaii[oi] | hawaii[di])
    mainland_idx = np.flatnonzero(~hawaii)
    oi[bad] = g.choice(mainland_idx, size=int(bad.sum()))
    di[bad] = g.choice(mainland_idx, size=int(bad.sum()))
    # The reassignments above can reintroduce origin==dest; repair while
    # preserving the regional-carriers-stay-mainland invariant.
    loop = np.flatnonzero(oi == di)
    for _ in range(10):
        if len(loop) == 0:
            break
        di[loop] = np.where(
            regional[loop],
            g.choice(mainland_idx, size=len(loop)),
            g.integers(0, len(apt), size=len(loop)),
        )
        loop = loop[oi[loop] == di[loop]]

    # Departure hour: bimodal with morning/evening peaks; delays grow
    # through the day (Q7: early morning is best).
    hour = np.clip(
        np.where(
            g.random(n) < 0.5,
            g.normal(8, 3, n),
            g.normal(17, 3.5, n),
        ).astype(int) % 24,
        0,
        23,
    )
    minute = g.integers(0, 60, n)
    crs_dep_time = hour * 100 + minute

    hour_effect = np.maximum(0.0, (hour - 5) * 1.2)  # late day → worse
    weather = np.zeros(n)
    ocity = city[oi]
    for cty, w in _BAD_WEATHER_CITIES.items():
        m = ocity == cty
        weather[m] = g.exponential(w, int(m.sum())) * (g.random(int(m.sum())) < 0.25)
    for cty, w in _GOOD_WEATHER_CITIES.items():
        m = ocity == cty
        weather[m] = g.exponential(w, int(m.sum())) * (g.random(int(m.sum())) < 0.05)

    dep_delay = (
        g.exponential(8.0, n)
        - 5.0
        + mean_delay[ci]
        + hour_effect
        + weather
        + g.normal(0, 4, n)
    ).round(0)
    arr_delay = (dep_delay + g.normal(-2, 12, n)).round(0)

    cancelled = (g.random(n) < cancel_p[ci] * (1 + weather / 10.0)).astype("int64")
    diverted = (g.random(n) < 0.002).astype("int64")

    # Great-circle-ish distance proxy: airport index distance plus noise;
    # Hawaii/Alaska routes are long. Longest flights: HNL<->JFK area (Q11).
    base_dist = 150 + np.abs(oi - di) * 120 + g.integers(0, 300, n)
    long_haul = hawaii[oi] ^ hawaii[di]
    dist = np.where(long_haul, base_dist + 2500, base_dist).astype("int64")
    air_time = (dist / 8.0 + g.normal(20, 10, n)).round(0)
    taxi_out = np.maximum(1, g.normal(16, 5, n) + (codes[ci] == "UA") * 2.0).round(0)
    taxi_in = np.maximum(1, g.normal(7, 3, n)).round(0)

    dep_time = np.where(
        cancelled == 1, np.nan, (crs_dep_time + dep_delay).clip(0, 2359)
    )
    # Missing values: delays undefined for cancelled flights (the paper
    # stresses the dataset has undefined values).
    dep_delay = np.where(cancelled == 1, np.nan, dep_delay)
    arr_delay = np.where((cancelled == 1) | (diverted == 1), np.nan, arr_delay)
    air_time = np.where((cancelled == 1) | (diverted == 1), np.nan, air_time)

    return pd.DataFrame(
        {
            "year": date.year.astype("int64"),
            "month": date.month.astype("int64"),
            "day_of_month": date.day.astype("int64"),
            "day_of_week": (date.dayofweek + 1).astype("int64"),
            "flight_date": date,
            "carrier": codes[ci],
            "flight_num": g.integers(1, 3000, n).astype("int64"),
            "origin": apt[oi],
            "origin_city": city[oi],
            "origin_state": state[oi],
            "dest": apt[di],
            "dest_city": city[di],
            "dest_state": state[di],
            "crs_dep_time": crs_dep_time.astype("int64"),
            "dep_time": dep_time,
            "dep_delay": dep_delay,
            "arr_delay": arr_delay,
            "taxi_in": taxi_in,
            "taxi_out": taxi_out,
            "cancelled": cancelled,
            "diverted": diverted,
            "distance": dist,
            "air_time": air_time,
            "weather_delay": weather.round(1),
        }
    )
