"""Shared fixtures: small deterministic datasets, built once per session."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_data import flights_pdf


@pytest.fixture(scope="session")
def fl_pdf() -> pd.DataFrame:
    """Flights at SF=0.01 (~13k rows) as pandas, for local sketch tests
    and as DuckDB oracle input."""
    return flights_pdf(sf=0.01)


@pytest.fixture(scope="session")
def fl_parts(fl_pdf) -> list[pd.DataFrame]:
    """The same rows split into 4 stripes — simulated leaf shards."""
    return [fl_pdf.iloc[i::4].reset_index(drop=True) for i in range(4)]


@pytest.fixture(scope="session")
def fl_df(spark, fl_pdf):
    """Flights as a persisted 8-partition Spark DataFrame."""
    df = spark.createDataFrame(fl_pdf).repartition(8).persist()
    df.count()
    return df


@pytest.fixture(scope="session")
def fl_table(spark, fl_df):
    from repro.engine.table import HillviewTable

    return HillviewTable(spark, df=fl_df, base_id="flights-0.01")


@pytest.fixture(scope="session")
def zipf_pdf() -> pd.DataFrame:
    """Skewed string keys for heavy-hitter tests."""
    g = np.random.default_rng(11)
    ranks = np.arange(1, 201)
    w = 1.0 / ranks**1.3
    w /= w.sum()
    keys = g.choice(ranks, size=40_000, p=w)
    return pd.DataFrame({"k": [f"key{int(x):03d}" for x in keys]})
