"""Unit tests for key normalization and hash mixing (no Spark needed)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.bloom.hashing import combine_columns, mix64, series_to_u64


class TestMix64:
    def test_deterministic(self):
        x = np.arange(100, dtype=np.uint64)
        assert (mix64(x) == mix64(x)).all()

    def test_distinct_inputs_distinct_outputs(self):
        out = mix64(np.arange(10_000, dtype=np.uint64))
        assert len(np.unique(out)) == 10_000

    def test_avalanche_ish(self):
        # Consecutive inputs should not produce consecutive outputs.
        out = mix64(np.arange(1000, dtype=np.uint64)).astype(np.int64)
        assert np.abs(np.diff(out)).min() > 1000

    def test_shape_preserved(self):
        assert mix64(np.zeros(7, dtype=np.uint64)).shape == (7,)


class TestSeriesToU64:
    def test_int64(self):
        s = pd.Series([1, -1, 2**62, -(2**62)])
        out = series_to_u64(s)
        assert out.dtype == np.uint64 and len(out) == 4

    def test_int32_matches_int64(self):
        a = series_to_u64(pd.Series(np.array([1, 5, -7], dtype=np.int32)))
        b = series_to_u64(pd.Series(np.array([1, 5, -7], dtype=np.int64)))
        assert (a == b).all()

    def test_bool(self):
        out = series_to_u64(pd.Series([True, False, True]))
        assert (out == np.array([1, 0, 1], dtype=np.uint64)).all()

    def test_float_negative_zero_equals_zero(self):
        out = series_to_u64(pd.Series([0.0, -0.0]))
        assert out[0] == out[1]

    def test_float_nan_maps_like_null(self):
        out = series_to_u64(pd.Series([np.nan, 0.0]))
        assert out[0] == out[1]  # both normalized to 0.0

    def test_int_null_maps_to_zero_hash(self):
        a = series_to_u64(pd.Series([1, None], dtype="Int64"))
        b = series_to_u64(pd.Series([1, 0], dtype="Int64"))
        assert (a == b).all()

    def test_datetime(self):
        s = pd.Series(pd.to_datetime(["1994-01-01", "1995-06-15"]))
        out = series_to_u64(s)
        assert out.dtype == np.uint64 and out[0] != out[1]

    def test_datetime_equal_values_equal_hashes(self):
        a = series_to_u64(pd.Series(pd.to_datetime(["1994-01-01"])))
        b = series_to_u64(pd.Series(pd.to_datetime(["1994-01-01"])))
        assert a[0] == b[0]

    def test_strings_deterministic(self):
        s = pd.Series(["ASIA", "EUROPE", "ASIA"])
        out = series_to_u64(s)
        assert out[0] == out[2] and out[0] != out[1]
        assert (out == series_to_u64(s.copy())).all()

    def test_string_null(self):
        out = series_to_u64(pd.Series(["x", None]))
        assert out.dtype == np.uint64 and len(out) == 2


class TestCombineColumns:
    def test_single_column_deterministic(self):
        s = pd.Series([1, 2, 3])
        assert (combine_columns([s]) == combine_columns([s.copy()])).all()

    def test_two_columns_differ_from_one(self):
        a, b = pd.Series([1, 2]), pd.Series([3, 4])
        assert not (combine_columns([a, b]) == combine_columns([a])).all()

    def test_column_order_matters(self):
        a, b = pd.Series([1, 2]), pd.Series([3, 4])
        assert not (combine_columns([a, b]) == combine_columns([b, a])).all()

    def test_pairs_distinct(self):
        # (1,2) must hash differently from (2,1) and (1,1)
        a = combine_columns([pd.Series([1, 2, 1]), pd.Series([2, 1, 1])])
        assert len(set(a.tolist())) == 3

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            combine_columns([])

    def test_mixed_types(self):
        out = combine_columns(
            [pd.Series([1, 2]), pd.Series(["a", "b"]), pd.Series([0.5, 1.5])]
        )
        assert out.dtype == np.uint64 and out[0] != out[1]

    @settings(max_examples=30, deadline=None)
    @given(st.lists(st.integers(min_value=-(10**9), max_value=10**9), min_size=1, max_size=50))
    def test_build_probe_symmetry(self, xs):
        """Same values in a fresh Series hash identically — the property
        the no-false-negative guarantee rests on."""
        a = combine_columns([pd.Series(xs)])
        b = combine_columns([pd.Series(list(xs))])
        assert (a == b).all()
