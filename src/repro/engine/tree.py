"""Execution tree for vizketches (paper §5.2–5.3).

One query = one tree. Leaves are Spark partitions (the paper's
micropartitions, one leaf per shard served by a thread pool — here
Spark's task scheduler over ``local[*]`` cores). Each leaf applies the
table's derivation ops (membership filters + map columns, §5.6) and the
sketch's ``summarize`` over its Arrow batches, then ships the
serialized summary up to an aggregation node; aggregation nodes with
fanout ``F`` merge their children; the root merges aggregation results
and renders.

Progressive results (§5.3): aggregation nodes forward partially merged
summaries instead of waiting for all children; the root emits a partial
after every aggregation window. We simulate arrival order with a
seed-deterministic shuffle of leaf completions and record every byte
that crosses an edge into the root — the quantity plotted in Fig. 5's
bandwidth graph. Cancellation (§5.3) is modeled by processing only a
prefix of leaves.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Any, Iterator

import numpy as np
import pandas as pd
from pyspark import TaskContext
from pyspark.sql import DataFrame

from repro.core.sketch import Sketch, leaf_rng
from repro.engine.cache import ComputationCache
from repro.engine.table import HillviewTable, LeafStats, apply_ops

#: Aggregation window — the paper's nodes batch children arriving
#: within 0.1 s; we batch a fixed number of leaf completions instead so
#: runs are deterministic, defaulting to one partial per agg node.
DEFAULT_FANOUT = 8


@dataclass
class TreeResult:
    """Everything the root knows after a query."""

    value: Any  # final summary
    partials: list = field(default_factory=list)  # progressive summaries
    n_leaves: int = 0
    leaves_processed: int = 0
    root_bytes: int = 0  # bytes received by the root, incl. partials
    leaf_bytes: int = 0  # bytes the leaves sent to aggregation nodes
    wall_time: float = 0.0
    leaf_phase_time: float = 0.0  # scatter + summarize + collect
    merge_phase_time: float = 0.0  # aggregation-tree merge at the root
    from_cache: bool = False
    cancelled: bool = False
    leaf_stats: list[LeafStats] = field(default_factory=list)


def _leaf_payloads_spark(
    table: HillviewTable, sketch: Sketch, seed: int, presample_rate: float | None
) -> list[tuple[int, bytes, LeafStats]]:
    """Run summarize on every partition; collect (pid, payload, stats).

    Uses ``mapInPandas`` so the whole leaf computation stays on the
    DataFrame/Arrow path; one output row per partition. Batches within
    a partition are folded with ``merge`` — legal for any mergeable
    summary, and the per-leaf RNG is shared across batches so the
    partition's sample is one draw.
    """
    import pickle

    df = table.dataframe()
    if presample_rate is not None and presample_rate < 1.0:
        # §4.2 footnote 3: a leaf "might choose to sample or scan the
        # data in the chunk". Sampling in the JVM, before the Arrow
        # boundary, means unsampled rows never reach the Python leaf —
        # per-leaf work shrinks as leaves are added while the total
        # sample stays display-sized (the super-linear effect of
        # Fig. 7/8). Uniform Bernoulli commutes with the table's filter
        # ops, so derived tables stay unbiased; counts must be scaled by
        # 1/rate at render time.
        df = df.sample(withReplacement=False, fraction=presample_rate, seed=seed)
    # Capture only picklable state in the leaf closure: the derivation
    # ops and the sketch. The table itself holds the SparkSession.
    ops = table.ops

    def per_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        pid = TaskContext.get().partitionId()
        rng = leaf_rng(seed, pid)
        acc = sketch.zero()
        stats = LeafStats()
        saw = False
        for pdf in batches:
            saw = True
            work, st = apply_ops(ops, pdf)
            stats.base_rows += st.base_rows
            stats.member_rows += st.member_rows
            stats.membership_kind = st.membership_kind
            stats.membership_bytes += st.membership_bytes
            acc = sketch.merge(acc, sketch.summarize(work, rng))
        if not saw:
            # Empty partition still reports a zero summary so the tree
            # shape (and progress bar denominator) is stable.
            pass
        yield pd.DataFrame(
            {
                "pid": [pid],
                "payload": [sketch.to_bytes(acc)],
                "stats": [pickle.dumps(stats)],
            }
        )

    rows = df.mapInPandas(
        per_partition, schema="pid int, payload binary, stats binary"
    ).collect()
    return [(r.pid, bytes(r.payload), pickle.loads(bytes(r.stats))) for r in rows]


def _merge_tree(
    sketch: Sketch,
    payloads: list[bytes],
    fanout: int,
    arrival_seed: int,
) -> tuple[Any, list, int, int]:
    """Simulate the aggregation tree over collected leaf payloads.

    Leaves complete in a seed-deterministic shuffled order (stragglers
    arrive late). They are assigned to aggregation nodes of ``fanout``
    children by position in that order; as each aggregation node fills,
    it ships its merged summary to the root, which merges it in and
    emits a progressive partial. Returns (final, partials, root_bytes,
    leaf_bytes).
    """
    order = np.random.default_rng(arrival_seed).permutation(len(payloads))
    root_acc = sketch.zero()
    partials: list = []
    root_bytes = 0
    leaf_bytes = 0
    agg_acc = sketch.zero()
    in_agg = 0
    for i, leaf_ix in enumerate(order):
        b = payloads[leaf_ix]
        leaf_bytes += len(b)
        agg_acc = sketch.merge(agg_acc, sketch.from_bytes(b))
        in_agg += 1
        last = i == len(order) - 1
        if in_agg == fanout or last:
            shipped = sketch.to_bytes(agg_acc)
            root_bytes += len(shipped)
            root_acc = sketch.merge(root_acc, sketch.from_bytes(shipped))
            partials.append(root_acc)
            agg_acc = sketch.zero()
            in_agg = 0
    return root_acc, partials, root_bytes, leaf_bytes


def run_sketch(
    table: HillviewTable | DataFrame,
    sketch: Sketch,
    *,
    seed: int = 0,
    fanout: int = DEFAULT_FANOUT,
    cache: ComputationCache | None = None,
    cancel_after_leaves: int | None = None,
    presample_rate: float | None = None,
) -> TreeResult:
    """Execute one vizketch query through the engine.

    ``cache`` short-circuits repeated deterministic computations
    (§5.4). ``cancel_after_leaves`` models user cancellation: only that
    many leaves are merged; the result is marked cancelled and equals
    the last partial the user saw. ``presample_rate`` applies the
    sketch's sampling rate in the JVM before rows reach the leaf (use
    with a *streaming* sketch; render-side counts scale by 1/rate).
    """
    if isinstance(table, DataFrame):
        table = HillviewTable(table.sparkSession, df=table)

    deterministic = sketch.deterministic and presample_rate is None
    cache_seed = None if deterministic else seed
    key = None
    if cache is not None:
        key = ComputationCache.key(
            table.version_id,
            f"{sketch.cache_key()}|pre={presample_rate}",
            cache_seed,
        )
        hit = cache.get(key)
        if hit is not None:
            return TreeResult(value=hit, from_cache=True)

    t0 = time.perf_counter()
    leaf_rows = _leaf_payloads_spark(table, sketch, seed, presample_rate)
    t_leaves = time.perf_counter() - t0
    leaf_rows.sort(key=lambda t: t[0])
    payloads = [p for _, p, _ in leaf_rows]
    stats = [s for _, _, s in leaf_rows]
    n_leaves = len(payloads)

    processed = payloads
    cancelled = False
    if cancel_after_leaves is not None and cancel_after_leaves < n_leaves:
        # Cancellation removes queued work; already-started leaves finish
        # (the paper does not interrupt in-flight micropartitions).
        arrival = np.random.default_rng(seed).permutation(n_leaves)
        processed = [payloads[i] for i in arrival[:cancel_after_leaves]]
        cancelled = True

    final, partials, root_bytes, leaf_bytes = _merge_tree(
        sketch, processed, fanout, arrival_seed=seed
    )
    wall = time.perf_counter() - t0

    if cache is not None and key is not None and not cancelled:
        cache.put(key, final)

    return TreeResult(
        value=final,
        partials=partials,
        n_leaves=n_leaves,
        leaves_processed=len(processed),
        root_bytes=root_bytes,
        leaf_bytes=leaf_bytes,
        wall_time=wall,
        leaf_phase_time=t_leaves,
        merge_phase_time=wall - t_leaves,
        cancelled=cancelled,
        leaf_stats=stats,
    )


def run_local(
    parts: list[pd.DataFrame],
    sketch: Sketch,
    *,
    seed: int = 0,
    fanout: int = DEFAULT_FANOUT,
) -> TreeResult:
    """Engine semantics without Spark: leaves are in-memory frames.

    Used by unit tests and the single-thread microbenchmark (§7.2.1),
    where the tree is one leaf directly under the root.
    """
    t0 = time.perf_counter()
    payloads = [
        sketch.to_bytes(sketch.summarize(pdf, leaf_rng(seed, pid)))
        for pid, pdf in enumerate(parts)
    ]
    final, partials, root_bytes, leaf_bytes = _merge_tree(
        sketch, payloads, fanout, arrival_seed=seed
    )
    return TreeResult(
        value=final,
        partials=partials,
        n_leaves=len(parts),
        leaves_processed=len(parts),
        root_bytes=root_bytes,
        leaf_bytes=leaf_bytes,
        wall_time=time.perf_counter() - t0,
    )
