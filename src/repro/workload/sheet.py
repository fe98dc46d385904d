"""The spreadsheet facade: UI actions → vizketch execution trees.

Every user-visible action of Hillview maps to one or more vizketches
(paper Fig. 14): drawing a chart runs Range then the chart's vizketch;
changing the table view runs Next items; the scroll bar runs Quantile
then Next items; etc. :class:`Spreadsheet` implements that mapping over
one :class:`~repro.engine.table.HillviewTable`, sharing a computation
cache across actions (ranges are cached after the first chart, §5.3)
and accumulating per-action metrics (trees launched, wall time, bytes
received by the root) — the quantities behind the Fig. 5/6 tables.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.bottomk import BottomKSketch, string_bucket_boundaries
from repro.core.buckets import CategoricalBucketer, NumericBucketer
from repro.core.distinct import HyperLogLogSketch
from repro.core.heatmap import HeatmapSketch, HeatmapTrellisSketch
from repro.core.heavy_hitters import MisraGriesSketch, SamplingHeavyHittersSketch
from repro.core.histogram import (
    CDFSketch,
    HistogramSamplingSketch,
    HistogramStreamingSketch,
    StringHistogramSketch,
)
from repro.core.moments import Moments, MomentsSketch
from repro.core.nextitems import FindTextSketch, NextItemsSketch, SortOrder, TopRows
from repro.core.quantile import QuantileSketch
from repro.core.pca import CorrelationSketch
from repro.core.stacked import StackedHistogramSketch
from repro.engine.cache import ComputationCache
from repro.engine.table import HillviewTable
from repro.engine.tree import TreeResult, run_sketch


@dataclass
class ActionMetrics:
    """Aggregate engine metrics for one spreadsheet action."""

    name: str
    trees: int = 0
    wall_time: float = 0.0
    root_bytes: int = 0
    first_partial_time: float = 0.0  # modeled; see Spreadsheet._track
    results: list[TreeResult] = field(default_factory=list)


class Spreadsheet:
    """One user's view of one table, with display parameters.

    ``width``/``height`` are the chart area in pixels; ``buckets`` the
    default histogram bar count; all sample sizes derive from these, as
    vizketches require. ``cores`` models the worker parallelism for the
    time-to-first-partial estimate.
    """

    def __init__(
        self,
        table: HillviewTable,
        cache: ComputationCache | None = None,
        width: int = 800,
        height: int = 200,
        buckets: int = 50,
        colors: int = 20,
        page_rows: int = 20,
        fanout: int = 8,
        seed: int = 0,
        cores: int | None = None,
    ):
        self.table = table
        self.cache = cache if cache is not None else ComputationCache()
        self.width = width
        self.height = height
        self.buckets = buckets
        self.colors = colors
        self.page_rows = page_rows
        self.fanout = fanout
        self.seed = seed
        self.cores = cores or 16
        self.history: list[ActionMetrics] = []

    # -- internals --------------------------------------------------------

    def _run(self, metrics: ActionMetrics, sketch, table=None) -> TreeResult:
        res = run_sketch(
            table if table is not None else self.table,
            sketch,
            seed=self.seed,
            fanout=self.fanout,
            cache=self.cache,
        )
        metrics.trees += 1
        prior_wall = metrics.wall_time
        metrics.wall_time += res.wall_time
        metrics.root_bytes += res.root_bytes
        # Modeled time-to-first-partial for the action: all earlier
        # trees (prepare phases) must finish, then the root renders
        # after the first aggregation window (fanout leaves) of the
        # current tree completes. Leaves run in waves of `cores`; the
        # first window needs ceil(fanout/cores) of ceil(n/cores) waves,
        # plus its share of the merge time.
        if res.n_leaves > 0 and not res.from_cache:
            waves_first = np.ceil(self.fanout / self.cores)
            waves_all = max(1.0, np.ceil(res.n_leaves / self.cores))
            metrics.first_partial_time = prior_wall + (
                res.leaf_phase_time * min(1.0, waves_first / waves_all)
                + res.merge_phase_time / max(1, len(res.partials))
            )
        metrics.results.append(res)
        return res

    def _metrics(self, name: str) -> ActionMetrics:
        m = ActionMetrics(name)
        self.history.append(m)
        return m

    # -- prepare-phase sketches (cached, §5.3 first tree) -----------------

    def column_range(self, column: str, metrics: ActionMetrics | None = None) -> Moments:
        m = metrics if metrics is not None else self._metrics(f"range({column})")
        return self._run(m, MomentsSketch(column)).value

    def string_buckets(
        self, column: str, metrics: ActionMetrics | None = None, max_buckets: int | None = None
    ) -> list[str]:
        m = metrics if metrics is not None else self._metrics(f"distinct({column})")
        bk = self._run(m, BottomKSketch(column, k=500)).value
        return string_bucket_boundaries(bk, max_buckets or self.buckets)

    # -- tabular view -----------------------------------------------------

    def sort_view(
        self, *order_spec, k: int | None = None, after: tuple | None = None
    ) -> tuple[TopRows, ActionMetrics]:
        """Initial/paged tabular view: the Next-items vizketch."""
        order = SortOrder.of(*order_spec)
        m = self._metrics(f"sort{order.columns}")
        res = self._run(
            m, NextItemsSketch(order, k=k or self.page_rows, after=after)
        )
        return res.value, m

    def scroll_to(self, column: str, position: float) -> tuple[TopRows, ActionMetrics]:
        """Scroll bar: Quantile then Next items (Fig. 14)."""
        m = self._metrics(f"scroll({column},{position:.2f})")
        rng = self.column_range(column, m)
        q = self._run(
            m,
            QuantileSketch(
                column, v_pixels=self.height, total_rows=rng.total_rows
            ),
        )
        target = QuantileSketch(
            column, v_pixels=self.height, total_rows=rng.total_rows
        ).quantile(q.value, position)
        res = self._run(
            m,
            NextItemsSketch(
                SortOrder.of(column), k=self.page_rows, after=(target,)
            ),
        )
        return res.value, m

    def find_text(
        self, column: str, pattern: str, *order_spec, mode: str = "substring", k: int = 1
    ) -> tuple[TopRows, ActionMetrics]:
        m = self._metrics(f"find({column},{pattern!r})")
        res = self._run(
            m,
            FindTextSketch(column, pattern, SortOrder.of(*order_spec), k=k, mode=mode),
        )
        return res.value, m

    # -- charts (prepare + render, §5.3 two trees) ------------------------

    def histogram(
        self, column: str, sample: bool = True, with_cdf: bool = True
    ) -> tuple[TreeResult, ActionMetrics]:
        m = self._metrics(f"histogram({column})")
        rng = self.column_range(column, m)
        if sample:
            hist = HistogramSamplingSketch(
                column, rng.min, rng.max, self.buckets, self.height, rng.total_rows
            )
        else:
            hist = HistogramStreamingSketch(column, rng.min, rng.max, self.buckets)
        res = self._run(m, hist)
        if with_cdf:
            self._run(
                m,
                CDFSketch(
                    column, rng.min, rng.max, self.width, self.height, rng.total_rows
                ),
            )
        return res, m

    def string_histogram(self, column: str) -> tuple[TreeResult, ActionMetrics]:
        m = self._metrics(f"string_histogram({column})")
        bounds = self.string_buckets(column, m)
        res = self._run(m, StringHistogramSketch(column, bounds))
        return res, m

    def stacked_histogram(
        self, x_column: str, y_column: str, y_values: list | None = None, with_cdf: bool = True
    ) -> tuple[TreeResult, ActionMetrics]:
        m = self._metrics(f"stacked({x_column},{y_column})")
        xr = self.column_range(x_column, m)
        xb = NumericBucketer(xr.min, xr.max, self.buckets)
        if y_values is None:
            yr = self.column_range(y_column, m)
            yb = NumericBucketer(yr.min, yr.max, self.colors)
        else:
            yb = CategoricalBucketer(y_values)
        res = self._run(
            m,
            StackedHistogramSketch(
                x_column, y_column, xb, yb, v_pixels=self.height,
                total_rows=xr.total_rows,
            ),
        )
        if with_cdf:
            self._run(
                m,
                CDFSketch(
                    x_column, xr.min, xr.max, self.width, self.height, xr.total_rows
                ),
            )
        return res, m

    def stacked_categorical(
        self, x_column: str, x_values: list, y_column: str, y_buckets: int | None = None
    ) -> tuple[TreeResult, ActionMetrics]:
        """Stacked histogram with a categorical X axis (one bar per
        value) and numeric Y subdivisions — e.g. per-carrier delay
        distributions. Exact (streaming), as for normalized rendering."""
        m = self._metrics(f"stacked_cat({x_column},{y_column})")
        yr = self.column_range(y_column, m)
        xb = CategoricalBucketer(x_values)
        yb = NumericBucketer(yr.min, yr.max, y_buckets or self.colors)
        res = self._run(
            m,
            StackedHistogramSketch(
                x_column, y_column, xb, yb, v_pixels=self.height,
                total_rows=yr.total_rows, sample=False,
            ),
        )
        return res, m

    def heatmap(
        self, x_column: str, y_column: str, pixel_block: int = 3
    ) -> tuple[TreeResult, ActionMetrics]:
        m = self._metrics(f"heatmap({x_column},{y_column})")
        xr = self.column_range(x_column, m)
        yr = self.column_range(y_column, m)
        xb = NumericBucketer(xr.min, xr.max, max(1, self.width // pixel_block))
        yb = NumericBucketer(yr.min, yr.max, max(1, self.height // pixel_block))
        res = self._run(
            m,
            HeatmapSketch(
                x_column, y_column, xb, yb, colors=self.colors,
                total_rows=xr.total_rows,
            ),
        )
        return res, m

    def trellis_heatmap(
        self, w_column: str, w_values: list, x_column: str, y_column: str
    ) -> tuple[TreeResult, ActionMetrics]:
        m = self._metrics(f"trellis({w_column},{x_column},{y_column})")
        xr = self.column_range(x_column, m)
        yr = self.column_range(y_column, m)
        k = max(1, len(w_values))
        # Inner plots shrink as the trellis grows (App. B.1).
        cols = int(np.ceil(np.sqrt(k)))
        xb = NumericBucketer(xr.min, xr.max, max(1, self.width // (3 * cols)))
        yb = NumericBucketer(yr.min, yr.max, max(1, self.height // (3 * cols)))
        res = self._run(
            m,
            HeatmapTrellisSketch(
                w_column, x_column, y_column,
                CategoricalBucketer(w_values), xb, yb,
                colors=self.colors, total_rows=xr.total_rows,
            ),
        )
        return res, m

    # -- analyses ---------------------------------------------------------

    def heavy_hitters(
        self,
        column: str,
        k: int = 20,
        method: str = "sampling",
        threshold: float | None = None,
    ) -> tuple[list, ActionMetrics]:
        m = self._metrics(f"heavy_hitters({column})")
        if method == "sampling":
            # Sampling HH needs the table size to set its rate; the row
            # count is a cheap deterministic prepare sketch (cached).
            from repro.core.moments import CountSketch

            count = self._run(m, CountSketch()).value.rows
            sk = SamplingHeavyHittersSketch(column, k=k, total_rows=count)
            res = self._run(m, sk)
            return sk.heavy_hitters(res.value), m
        sk = MisraGriesSketch(column, k=k)
        res = self._run(m, sk)
        return sk.heavy_hitters(res.value, threshold=threshold), m

    def distinct_count(self, column: str) -> tuple[float, ActionMetrics]:
        m = self._metrics(f"distinct_count({column})")
        sk = HyperLogLogSketch(column)
        res = self._run(m, sk)
        return sk.estimate(res.value), m

    def pca(self, columns: list[str], k: int = 2) -> tuple[tuple, ActionMetrics]:
        m = self._metrics(f"pca({columns})")
        from repro.core.moments import CountSketch

        count = self._run(m, CountSketch()).value.rows
        sk = CorrelationSketch(columns, total_rows=count)
        res = self._run(m, sk)
        return sk.principal_components(res.value, k), m

    # -- derivations (§5.6), returning a new sheet over the derived table -

    def filtered(self, name: str, predicate) -> "Spreadsheet":
        return self._derived_sheet(self.table.filter(name, predicate))

    def with_column(self, name: str, fn) -> "Spreadsheet":
        return self._derived_sheet(self.table.with_column(name, fn))

    def _derived_sheet(self, table: HillviewTable) -> "Spreadsheet":
        s = Spreadsheet(
            table,
            cache=self.cache,
            width=self.width,
            height=self.height,
            buckets=self.buckets,
            colors=self.colors,
            page_rows=self.page_rows,
            fanout=self.fanout,
            seed=self.seed,
            cores=self.cores,
        )
        s.history = self.history  # shared metrics stream for a session
        return s
