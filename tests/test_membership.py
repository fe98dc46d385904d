"""Membership sets: representation choice, sampling, composition (§5.6)."""
import numpy as np
import pytest

from repro.core.sketch import leaf_rng
from repro.engine.membership import (
    SPARSE_THRESHOLD,
    DenseMembership,
    SparseMembership,
    full_membership,
    make_membership,
)


def mask_with_density(n: int, density: float, seed: int = 0) -> np.ndarray:
    g = np.random.default_rng(seed)
    return g.random(n) < density


class TestRepresentationChoice:
    def test_dense_filter_uses_bitmap(self):
        m = make_membership(mask_with_density(10_000, 0.5))
        assert isinstance(m, DenseMembership)

    def test_sparse_filter_uses_index_array(self):
        m = make_membership(mask_with_density(10_000, 0.001))
        assert isinstance(m, SparseMembership)

    def test_threshold_boundary(self):
        n = 64_000
        dense = np.zeros(n, dtype=bool)
        dense[: int(n * SPARSE_THRESHOLD)] = True
        assert isinstance(make_membership(dense), DenseMembership)
        sparse = np.zeros(n, dtype=bool)
        sparse[: int(n * SPARSE_THRESHOLD) - 10] = True
        assert isinstance(make_membership(sparse), SparseMembership)

    def test_sparse_is_smaller_when_sparse(self):
        mask = mask_with_density(100_000, 0.001)
        assert (
            SparseMembership(np.flatnonzero(mask), len(mask)).memory_bytes()
            < DenseMembership(mask).memory_bytes()
        )

    def test_empty(self):
        m = make_membership(np.zeros(100, dtype=bool))
        assert m.size() == 0 and len(m.indices()) == 0


@pytest.mark.parametrize("density", [0.5, 0.01])
class TestRoundtrip:
    def test_mask_indices_consistent(self, density):
        mask = mask_with_density(5000, density)
        m = make_membership(mask)
        assert np.array_equal(m.mask(), mask)
        assert np.array_equal(m.indices(), np.flatnonzero(mask))
        assert m.size() == mask.sum()

    def test_indices_increasing(self, density):
        m = make_membership(mask_with_density(5000, density))
        idx = m.indices()
        assert (np.diff(idx) > 0).all()


class TestIntersect:
    def test_intersection_semantics(self):
        a = mask_with_density(2000, 0.5, seed=1)
        b = mask_with_density(2000, 0.5, seed=2)
        m = make_membership(a).intersect_mask(b)
        assert np.array_equal(m.mask(), a & b)

    def test_intersection_can_switch_representation(self):
        a = mask_with_density(100_000, 0.5, seed=1)
        b = mask_with_density(100_000, 0.02, seed=2)
        m = make_membership(a).intersect_mask(b)
        assert isinstance(m, SparseMembership)


@pytest.mark.parametrize("density", [0.6, 0.005])
class TestSampling:
    def test_sample_only_members(self, density):
        mask = mask_with_density(20_000, density)
        m = make_membership(mask)
        picked = m.sample(0.5, leaf_rng(0, 0))
        assert mask[picked].all()

    def test_sample_expected_size(self, density):
        mask = mask_with_density(200_000, density, seed=3)
        m = make_membership(mask)
        picked = m.sample(0.5, leaf_rng(1, 0))
        expect = 0.5 * m.size()
        assert abs(len(picked) - expect) < 0.15 * m.size() + 5

    def test_sample_rate_one_returns_all(self, density):
        mask = mask_with_density(5000, density)
        m = make_membership(mask)
        assert np.array_equal(np.sort(m.sample(1.0, leaf_rng(0, 0))), m.indices())

    def test_sample_deterministic(self, density):
        mask = mask_with_density(5000, density)
        m = make_membership(mask)
        a = m.sample(0.3, leaf_rng(7, 0))
        b = m.sample(0.3, leaf_rng(7, 0))
        assert np.array_equal(a, b)

    def test_sample_approximately_uniform(self, density):
        """Every member index is picked with roughly equal frequency."""
        mask = mask_with_density(400, density if density > 0.1 else 0.05, seed=4)
        m = make_membership(mask)
        hits = np.zeros(400)
        for t in range(300):
            hits[m.sample(0.5, leaf_rng(t, 0))] += 1
        members = hits[mask.astype(bool)] if isinstance(mask, np.ndarray) else hits
        members = hits[np.flatnonzero(mask)]
        assert abs(members.mean() - 150) < 25
        assert members.std() < 40


class TestFullMembership:
    def test_all_rows(self):
        m = full_membership(10)
        assert m.size() == 10 and m.mask().all()
