"""Computation cache (§5.4): hits, seeds, TTL purge, soft-state clear."""
from repro.engine.cache import ComputationCache


class FakeClock:
    def __init__(self):
        self.t = 0.0

    def __call__(self):
        return self.t


class TestCache:
    def test_miss_then_hit(self):
        c = ComputationCache()
        key = ComputationCache.key("t1", "Moments(x)", None)
        assert c.get(key) is None
        c.put(key, 42)
        assert c.get(key) == 42
        assert c.stats.misses == 1 and c.stats.hits == 1

    def test_distinct_tables_do_not_collide(self):
        c = ComputationCache()
        c.put(ComputationCache.key("t1", "s", None), 1)
        assert c.get(ComputationCache.key("t2", "s", None)) is None

    def test_randomized_results_keyed_by_seed(self):
        c = ComputationCache()
        c.put(ComputationCache.key("t", "s", 1), "seed1")
        assert c.get(ComputationCache.key("t", "s", 2)) is None
        assert c.get(ComputationCache.key("t", "s", 1)) == "seed1"

    def test_ttl_purge(self):
        clock = FakeClock()
        c = ComputationCache(ttl_seconds=100, clock=clock)
        c.put(("k",), "v")
        clock.t = 50
        assert c.get(("k",)) == "v"
        clock.t = 151  # 101s after the refresh at t=50
        assert c.get(("k",)) is None
        assert c.stats.evictions == 1

    def test_access_refreshes_recency(self):
        clock = FakeClock()
        c = ComputationCache(ttl_seconds=100, clock=clock)
        c.put(("k",), "v")
        clock.t = 90
        c.get(("k",))  # refresh
        clock.t = 180  # 90s since refresh: still alive
        assert c.get(("k",)) == "v"

    def test_clear_is_safe_soft_state(self):
        c = ComputationCache()
        c.put(("k",), "v")
        c.clear()
        assert len(c) == 0
        assert c.get(("k",)) is None  # just recompute, no error
