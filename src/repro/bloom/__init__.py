"""Bloom-filter substrate for predicate transfer.

The paper's prototype uses Apache Arrow's bloom filter inside FPDB; the
PySpark analogue here is a numpy bit array (``filter.BloomFilter``)
built distributedly with one ``mapInPandas`` scan per source table
(``spark_bloom.build_blooms`` — one scan produces *all* outgoing
filters, matching §3.2's filter-transformation algorithm) and probed
with a vectorized pandas UDF over a broadcast of the bit array
(``spark_bloom.bloom_filter_df``).
"""
from repro.bloom.filter import BloomFilter, optimal_params
from repro.bloom.hashing import combine_columns, mix64, series_to_u64
from repro.bloom.spark_bloom import BloomSpec, apply_blooms, bloom_filter_df, build_blooms

__all__ = [
    "BloomFilter",
    "optimal_params",
    "mix64",
    "series_to_u64",
    "combine_columns",
    "BloomSpec",
    "build_blooms",
    "bloom_filter_df",
    "apply_blooms",
]
