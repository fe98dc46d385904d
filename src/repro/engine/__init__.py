"""The Hillview engine substrate (paper §5).

Executes vizketches over an aggregation tree whose leaves are Spark
partitions (§5.2–5.3), with progressive partial results, byte
accounting, a computation cache (§5.4), membership sets and derived
columns for filtered/derived tables (§5.6), and a redo log with lazy
replay for soft-state fault tolerance (§5.7–5.8).
"""
from repro.engine.table import HillviewTable
from repro.engine.tree import TreeResult, run_sketch

__all__ = ["HillviewTable", "TreeResult", "run_sketch"]
