"""Vectorized 64-bit hashing for Bloom filters.

Keys arrive as pandas Series (one per join-key column). Each Series is
normalized to ``uint64`` (``series_to_u64``), multi-column keys are
hash-combined (``combine_columns``), and the result is mixed with the
splitmix64 finalizer (``mix64``). Build side and probe side go through
exactly the same functions, so a key present on the build side can
never be rejected on the probe side (no false negatives).

Everything is numpy; uint64 arithmetic wraps silently, which is exactly
the modular arithmetic splitmix64 wants.
"""
import numpy as np
import pandas as pd

_GOLDEN = np.uint64(0x9E3779B97F4A7C15)
_MIX1 = np.uint64(0xBF58476D1CE4E5B9)
_MIX2 = np.uint64(0x94D049BB133111EB)


def mix64(x: np.ndarray) -> np.ndarray:
    """splitmix64 finalizer over a uint64 array (full avalanche)."""
    z = x + _GOLDEN
    z = (z ^ (z >> np.uint64(30))) * _MIX1
    z = (z ^ (z >> np.uint64(27))) * _MIX2
    return z ^ (z >> np.uint64(31))


def series_to_u64(s: pd.Series) -> np.ndarray:
    """Normalize a pandas Series to a uint64 array, deterministically.

    Integers/bools cast; datetimes view their epoch ticks; floats view
    their bits (with -0.0 normalized to 0.0); everything else goes
    through pandas' siphash (``hash_array``, fixed default key — stable
    across processes). Nulls map to 0: a null join key never equi-
    matches, so whether the bloom passes it is irrelevant for
    soundness (passing it is at worst a false positive).
    """
    if pd.api.types.is_bool_dtype(s):
        return s.fillna(False).to_numpy(dtype=np.int64).view(np.uint64)
    if pd.api.types.is_integer_dtype(s):
        return s.fillna(0).to_numpy(dtype=np.int64).view(np.uint64)
    if pd.api.types.is_datetime64_any_dtype(s):
        v = s.to_numpy()
        return v.astype("datetime64[ns]").view("int64").view(np.uint64)
    if pd.api.types.is_float_dtype(s):
        v = s.fillna(0.0).to_numpy(dtype=np.float64).copy()
        v[v == 0.0] = 0.0  # collapse -0.0 and +0.0 to one bit pattern
        return v.view(np.uint64)
    arr = np.asarray(s.astype(object).where(s.notna(), ""), dtype=object)
    return pd.util.hash_array(arr).astype(np.uint64)


def combine_columns(cols: list) -> np.ndarray:
    """Hash-combine one or more key columns into one uint64 per row."""
    h = None
    for i, c in enumerate(cols):
        u = series_to_u64(c)
        # per-column salt computed in Python ints to avoid the numpy
        # scalar-overflow warning (wraparound is intended)
        salt = np.uint64(((i + 1) * int(_GOLDEN)) & 0xFFFFFFFFFFFFFFFF)
        part = mix64(u + salt)
        h = part if h is None else mix64(h ^ part)
    if h is None:
        raise ValueError("combine_columns needs at least one column")
    return h
