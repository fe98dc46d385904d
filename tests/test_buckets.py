"""Bucketer strategies shared by the 2-D vizketches."""
import numpy as np
import pandas as pd
import pytest

from repro.core.buckets import (
    CategoricalBucketer,
    NumericBucketer,
    StringRangeBucketer,
)


class TestNumericBucketer:
    def test_index_and_missing(self):
        b = NumericBucketer(0, 10, 5)
        idx, missing = b.index(pd.DataFrame({"x": [0.0, 9.9, 10.0, np.nan]}), "x")
        assert list(idx) == [0, 4, 4]
        assert missing == 1

    def test_labels(self):
        assert NumericBucketer(0, 10, 2).labels() == ["[0,5)", "[5,10)"]

    def test_out_of_range(self):
        b = NumericBucketer(0, 10, 5)
        idx, _ = b.index(pd.DataFrame({"x": [-5.0, 20.0]}), "x")
        assert list(idx) == [-1, -1]


class TestCategoricalBucketer:
    def test_known_values(self):
        b = CategoricalBucketer(["a", "b", "c"])
        idx, missing = b.index(pd.DataFrame({"x": ["b", "a", None, "c"]}), "x")
        assert list(idx) == [1, 0, 2]
        assert missing == 1

    def test_unknown_maps_to_minus_one(self):
        b = CategoricalBucketer(["a"])
        idx, _ = b.index(pd.DataFrame({"x": ["z"]}), "x")
        assert list(idx) == [-1]

    def test_numeric_categories(self):
        b = CategoricalBucketer([1, 2, 3])
        idx, _ = b.index(pd.DataFrame({"x": [3, 1]}), "x")
        assert list(idx) == [2, 0]

    def test_labels(self):
        assert CategoricalBucketer([1, "x"]).labels() == ["1", "x"]


class TestStringRangeBucketer:
    def test_alphabetical_ranges(self):
        b = StringRangeBucketer(["a", "m"])
        idx, _ = b.index(pd.DataFrame({"x": ["apple", "zebra", "mango"]}), "x")
        assert list(idx) == [0, 1, 1]

    def test_exact_boundary_goes_right_bucket(self):
        b = StringRangeBucketer(["a", "m"])
        idx, _ = b.index(pd.DataFrame({"x": ["m"]}), "x")
        assert idx[0] == 1

    def test_below_first_boundary(self):
        b = StringRangeBucketer(["b"])
        idx, _ = b.index(pd.DataFrame({"x": ["a"]}), "x")
        assert idx[0] == -1

    def test_missing_counted(self):
        b = StringRangeBucketer(["a"])
        _, missing = b.index(pd.DataFrame({"x": ["a", None]}), "x")
        assert missing == 1

    def test_requires_boundaries(self):
        with pytest.raises(ValueError):
            StringRangeBucketer([])
