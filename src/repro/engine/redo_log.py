"""Redo log, soft state, and lazy failure recovery (paper §5.7–5.8).

The root node keeps the only persistent structure in Hillview: a log of
the operations that created every dataset (base loads, filters, map
columns) together with the seeds of randomized computations. Worker
state — cached tables, cached summaries — is disposable soft state.
When the root references a table a worker no longer has, the worker
reports an error and the root lazily replays the lineage from the log,
recursing until it reaches data that can be re-read from the
repository. Vizketches replay deterministically because seeds are
logged (§5.8).

Here the "workers' soft state" is the registry's table objects plus the
computation cache; :meth:`RootNode.simulate_worker_failure` drops both,
and :meth:`RootNode.get_table` performs the lazy replay.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import SparkSession

from repro.engine.cache import ComputationCache
from repro.engine.table import HillviewTable, TableOp


@dataclass(frozen=True)
class LogEntry:
    """One replayable operation. ``kind`` ∈ {load, filter, map}."""

    kind: str
    table_id: str
    parent_id: str | None
    op_name: str | None
    seed: int | None = None


class MissingTableError(RuntimeError):
    """A worker reported that a referenced dataset no longer exists."""


class RootNode:
    """The root's view of the distributed object graph (§5.7).

    ``_loaders`` maps base-table ids to zero-arg constructors (re-read
    from the repository — the recursion's base case). ``_recipes`` maps
    derived-table ids to (parent id, TableOp). ``_live`` is the soft
    state: materialized HillviewTable handles, which a failure wipes.
    """

    def __init__(self, spark: SparkSession, cache: ComputationCache | None = None):
        self.spark = spark
        self.cache = cache if cache is not None else ComputationCache()
        self.log: list[LogEntry] = []
        self._loaders: dict[str, Callable[[], HillviewTable]] = {}
        self._recipes: dict[str, tuple[str, TableOp]] = {}
        self._live: dict[str, HillviewTable] = {}
        self.replays: int = 0

    # -- building the object graph ---------------------------------------

    def load_base(self, table_id: str, loader: Callable[[], HillviewTable]) -> HillviewTable:
        """Register a base dataset with a repository re-loader."""
        self._loaders[table_id] = loader
        self.log.append(LogEntry("load", table_id, None, None))
        t = loader()
        self._live[table_id] = t
        return t

    def derive(
        self, parent_id: str, table_id: str, op: TableOp, seed: int | None = None
    ) -> HillviewTable:
        """Apply a §5.6 derivation and log it (with its seed)."""
        parent = self.get_table(parent_id)
        child = parent._derive(op)
        self._recipes[table_id] = (parent_id, op)
        self._live[table_id] = child
        self.log.append(LogEntry(op.kind, table_id, parent_id, op.name, seed))
        return child

    # -- soft state and recovery -----------------------------------------

    def simulate_worker_failure(self) -> None:
        """Workers are stateless (§5.8): restart == losing every cached
        dataset and summary. The redo log survives (it lives at the root)."""
        self._live.clear()
        self.cache.clear()

    def get_table(self, table_id: str) -> HillviewTable:
        """Resolve a table id, lazily replaying the log if the live
        object is gone — the §5.7 re-execution recursion."""
        t = self._live.get(table_id)
        if t is not None:
            return t
        self.replays += 1
        if table_id in self._loaders:
            t = self._loaders[table_id]()  # re-read from the repository
        elif table_id in self._recipes:
            parent_id, op = self._recipes[table_id]
            t = self.get_table(parent_id)._derive(op)
        else:
            raise MissingTableError(
                f"table {table_id!r} is not in the redo log; cannot replay"
            )
        self._live[table_id] = t
        return t

    def is_live(self, table_id: str) -> bool:
        return table_id in self._live
