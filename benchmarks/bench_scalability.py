"""T4/T5 — Fig. 7/8 scalability of vizketches.

Leaves and rows grow together (constant rows/leaf); ideal scalability
is constant latency. Shape to reproduce: streaming stays ~flat while
total leaves fit the machine's cores; sampling gets *faster* as leaves
grow because the display-driven sample size is fixed, so per-leaf work
shrinks (the paper's super-linear scalability).

Regenerate: pytest benchmarks/bench_scalability.py --benchmark-only
"""
import pytest

from repro.core.histogram import HistogramStreamingSketch, histogram_sample_size
from repro.engine.table import HillviewTable
from repro.engine.tree import run_sketch
from repro.experiments import _numeric_df

ROWS_PER_LEAF = 200_000
LEAVES = [1, 2, 4, 8, 16]
SERVERS = [1, 2, 4, 8]  # simulated: 8 leaves/server, fanout 8


@pytest.fixture(scope="module")
def tables(spark):
    out = {}
    for n in set(LEAVES) | {s * 8 for s in SERVERS}:
        df = _numeric_df(spark, n * ROWS_PER_LEAF, n).persist()
        df.count()
        out[n] = HillviewTable(spark, df=df, base_id=f"scal-{n}")
    return out


def _sketch_and_rate(method, total_rows):
    """Sampling applies the display-driven rate in the JVM (leaves
    sample while reading the chunk) — per-leaf work shrinks as leaves
    grow, which is the paper's super-linear effect."""
    sk = HistogramStreamingSketch("x", -30, 120, 100)
    if method == "streaming":
        return sk, None
    return sk, min(1.0, histogram_sample_size(200) / max(1, total_rows))


@pytest.mark.parametrize("method", ["streaming", "sampling"])
@pytest.mark.parametrize("n", LEAVES)
def test_thread_scalability(benchmark, tables, method, n):
    sk, rate = _sketch_and_rate(method, n * ROWS_PER_LEAF)
    benchmark.pedantic(
        lambda: run_sketch(tables[n], sk, presample_rate=rate),
        rounds=3,
        warmup_rounds=1,
    )
    benchmark.extra_info["leaves"] = n
    benchmark.extra_info["rows"] = n * ROWS_PER_LEAF


@pytest.mark.parametrize("method", ["streaming", "sampling"])
@pytest.mark.parametrize("servers", SERVERS)
def test_server_scalability(benchmark, tables, method, servers):
    leaves = servers * 8
    sk, rate = _sketch_and_rate(method, leaves * ROWS_PER_LEAF)
    benchmark.pedantic(
        lambda: run_sketch(tables[leaves], sk, fanout=8, presample_rate=rate),
        rounds=3,
        warmup_rounds=1,
    )
    benchmark.extra_info["servers"] = servers
    benchmark.extra_info["rows"] = leaves * ROWS_PER_LEAF
