"""Vizketch library: mergeable summaries tuned to display resolution.

Every vizketch is a :class:`repro.core.sketch.Sketch` with pure,
single-threaded ``summarize`` / ``merge`` functions (paper §4.2). The
distributed aspects (partitioning, the aggregation tree, progressive
partials, caching, fault tolerance) live in :mod:`repro.engine` and are
shared by all vizketches — mirroring the paper's modularity claim
(§5.5): a new vizketch is just these two functions plus a summary type.
"""
from repro.core.sketch import Sketch, leaf_rng

__all__ = ["Sketch", "leaf_rng"]
