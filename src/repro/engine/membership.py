"""Membership sets for filtered tables (paper §5.6).

A derived (filtered) table shares the parent's data and stores, per
partition, which base rows it contains. Dense memberships use a packed
bitmap; sparse ones a sorted index array (the paper's hashset) — chosen
automatically by density. Both support the paper's two uniform-sampling
procedures: dense sets walk the bitmap in increasing index order with
Bernoulli skips; sparse sets traverse members in the order of their
(seeded) hash values and take a prefix, which is a uniformly random
subset because the hash order is a random permutation.
"""
from __future__ import annotations

from abc import ABC, abstractmethod

import numpy as np

#: Below this member density a bitmap wastes space; use the sparse form.
SPARSE_THRESHOLD = 1.0 / 32.0


class MembershipSet(ABC):
    """Which rows of an n-row partition belong to the derived table."""

    n_base: int

    @abstractmethod
    def size(self) -> int:
        """Number of member rows."""

    @abstractmethod
    def mask(self) -> np.ndarray:
        """Boolean mask of length ``n_base``."""

    @abstractmethod
    def indices(self) -> np.ndarray:
        """Member row indices, increasing."""

    @abstractmethod
    def sample(self, rate: float, rng: np.random.Generator) -> np.ndarray:
        """Uniform sample of member indices at ``rate``, without
        enumerating non-members more than once."""

    def memory_bytes(self) -> int:
        """Approximate storage footprint — what the density heuristic
        optimizes (bitmap: n/8 bytes; sparse: 8 bytes per member)."""
        raise NotImplementedError

    def intersect_mask(self, other_mask: np.ndarray) -> "MembershipSet":
        """Further filter: members that also satisfy ``other_mask``."""
        return make_membership(self.mask() & other_mask)


class DenseMembership(MembershipSet):
    """Packed-bitmap membership for dense filters."""

    def __init__(self, mask: np.ndarray):
        self.n_base = len(mask)
        self._bits = np.packbits(mask.astype(bool))
        self._size = int(np.count_nonzero(mask))

    def size(self) -> int:
        return self._size

    def mask(self) -> np.ndarray:
        return np.unpackbits(self._bits, count=self.n_base).astype(bool)

    def indices(self) -> np.ndarray:
        return np.flatnonzero(self.mask())

    def sample(self, rate: float, rng: np.random.Generator) -> np.ndarray:
        # "For dense tables we walk randomly the bitmap in increasing
        # index order": Bernoulli-select while scanning the bitmap.
        m = self.mask()
        keep = rng.random(self.n_base) < rate
        return np.flatnonzero(m & keep)

    def memory_bytes(self) -> int:
        return len(self._bits)


class SparseMembership(MembershipSet):
    """Sorted-index membership for sparse filters."""

    def __init__(self, indices: np.ndarray, n_base: int):
        self._idx = np.sort(np.asarray(indices, dtype=np.int64))
        self.n_base = int(n_base)

    def size(self) -> int:
        return len(self._idx)

    def mask(self) -> np.ndarray:
        m = np.zeros(self.n_base, dtype=bool)
        m[self._idx] = True
        return m

    def indices(self) -> np.ndarray:
        return self._idx

    def sample(self, rate: float, rng: np.random.Generator) -> np.ndarray:
        # "For sparse tables ... we generate the following samples by
        # returning the next elements in sorted order of their hash
        # values": hash-order traversal, take the rate-sized prefix.
        k = int(np.ceil(rate * len(self._idx)))
        if k >= len(self._idx):
            return self._idx
        # Seeded permutation stands in for the hash order (it is one).
        order = rng.permutation(len(self._idx))[:k]
        return np.sort(self._idx[order])

    def memory_bytes(self) -> int:
        return 8 * len(self._idx)


def make_membership(mask: np.ndarray) -> MembershipSet:
    """Pick the representation by density (§5.6)."""
    mask = np.asarray(mask, dtype=bool)
    n = len(mask)
    members = int(np.count_nonzero(mask))
    if n == 0 or members / max(1, n) >= SPARSE_THRESHOLD:
        return DenseMembership(mask)
    return SparseMembership(np.flatnonzero(mask), n)


def full_membership(n: int) -> MembershipSet:
    return DenseMembership(np.ones(n, dtype=bool))
