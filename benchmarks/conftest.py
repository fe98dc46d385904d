"""Benchmark fixtures: datasets sized for SF≈0.1 (~130k flights rows)."""
import pytest

from repro.engine.table import HillviewTable
from repro.experiments import single_thread_data
from repro.synth_data import flights


@pytest.fixture(scope="session")
def micro_pdf():
    """2M-row numeric column for the single-thread microbenchmark
    (scaled from the paper's 100M; ratios are what matters)."""
    return single_thread_data(2_000_000)


@pytest.fixture(scope="session")
def fl_df_bench(spark):
    df = flights(spark, sf=0.1).repartition(64).persist()
    df.count()
    return df


@pytest.fixture(scope="session")
def fl_table_bench(spark, fl_df_bench):
    return HillviewTable(spark, df=fl_df_bench, base_id="flights-bench")
