"""T2/T3 — Fig. 5/6 end-to-end spreadsheet operations.

One benchmark per (operation, system): the vizketch engine vs the
general-purpose Spark SQL baseline on flights SF=0.1 (≙ Flights-1x at
1/1000 row scale), warm; plus the cold (Parquet re-read) Hillview path
for the Fig. 6 rows. Shape to reproduce: Hillview at least matches
Spark on most ops; the heat map (O11) ships the most Hillview bytes.

Regenerate: pytest benchmarks/bench_end_to_end.py --benchmark-only
"""
import pytest

from repro.baseline import sparksql
from repro.engine.cache import ComputationCache
from repro.engine.table import HillviewTable
from repro.workload import Spreadsheet
from repro.workload.ops import ALL_OPS, COLD_SKIP

OPS = list(ALL_OPS)


def fresh_sheet(table):
    """Each measured run gets an empty computation cache so the bench
    measures the query, not a cache hit."""
    return Spreadsheet(table, cache=ComputationCache(), seed=0)


@pytest.mark.parametrize("op", OPS)
def test_hillview_warm(benchmark, fl_table_bench, op):
    fn = ALL_OPS[op]
    result = benchmark.pedantic(
        lambda: fn(fresh_sheet(fl_table_bench)), rounds=2, warmup_rounds=1
    )
    benchmark.extra_info["root_bytes"] = result.root_bytes
    benchmark.extra_info["first_partial_s"] = round(result.first_partial_time, 4)


@pytest.mark.parametrize("op", OPS)
def test_spark_baseline_warm(benchmark, fl_df_bench, op):
    fn = sparksql.ALL_OPS[op]
    result = benchmark.pedantic(
        lambda: fn(fl_df_bench), rounds=2, warmup_rounds=1
    )
    benchmark.extra_info["master_bytes"] = result.master_bytes


@pytest.fixture(scope="module")
def cold_table(spark, tmp_path_factory):
    from repro.synth_data import flights

    path = str(tmp_path_factory.mktemp("cold") / "flights")
    flights(spark, sf=0.1).repartition(64).write.parquet(path)
    spark.catalog.clearCache()
    return HillviewTable(spark, parquet_path=path, base_id="flights-cold")


@pytest.mark.parametrize("op", [o for o in OPS if o not in COLD_SKIP])
def test_hillview_cold(benchmark, cold_table, op):
    fn = ALL_OPS[op]
    result = benchmark.pedantic(
        lambda: fn(fresh_sheet(cold_table)), rounds=2, warmup_rounds=0
    )
    benchmark.extra_info["root_bytes"] = result.root_bytes
