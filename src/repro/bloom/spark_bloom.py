"""Distributed Bloom-filter build & probe over Spark DataFrames.

Build (``build_blooms``) mirrors §3.2's filter-transformation
algorithm: the source table is scanned **once** with ``mapInPandas``;
every executor partition accumulates one partial bit array *per
outgoing filter*, emits them as one binary row, and the driver ORs the
partials together. N outgoing edges still cost a single scan.

Probe (``bloom_filter_df``) broadcasts the word array and filters with
a vectorized pandas UDF over a struct of the key columns — an Arrow
batch in, a boolean mask out, no shuffle. This is the reproduction's
stand-in for "Bloom probes are much cheaper than hash-table probes"
(paper's β ≪ 1): with broadcast joins disabled, the alternative exact
semi-join *shuffles* both sides.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf

from repro.bloom.filter import BloomFilter, optimal_params
from repro.bloom.hashing import combine_columns, mix64


@dataclass(frozen=True)
class BloomSpec:
    """One filter to build: key columns + sizing."""

    cols: tuple[str, ...]
    expected_items: int
    fpp: float = 0.01

    def params(self) -> tuple[int, int]:
        return optimal_params(self.expected_items, self.fpp)


def _hash_frame(pdf: pd.DataFrame, cols: Sequence[str]) -> np.ndarray:
    return mix64(combine_columns([pdf[c] for c in cols]))


def build_blooms(df: DataFrame, specs: Sequence[BloomSpec]) -> list[BloomFilter]:
    """Build one Bloom filter per spec with a single scan of ``df``.

    Specs with identical ``cols`` still produce independent filters (the
    caller dedupes if it wants to share); all are filled from the same
    pass over the data.
    """
    if not specs:
        return []
    params = [s.params() for s in specs]
    needed = sorted({c for s in specs for c in s.cols})
    schema = ", ".join(f"b{i} binary" for i in range(len(specs)))
    spec_cols = [tuple(s.cols) for s in specs]

    def gen(batches: Iterable[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        partials = [
            np.zeros((n_bits + 63) // 64, dtype=np.uint64) for n_bits, _ in params
        ]
        filters = [BloomFilter(n_bits, k, w) for (n_bits, k), w in zip(params, partials)]
        for pdf in batches:
            if len(pdf) == 0:
                continue
            hashed = {cols: _hash_frame(pdf, cols) for cols in set(spec_cols)}
            for f, cols in zip(filters, spec_cols):
                f.add_hashed(hashed[cols])
        yield pd.DataFrame({f"b{i}": [f.to_bytes()] for i, f in enumerate(filters)})

    rows = df.select(*needed).mapInPandas(gen, schema).collect()
    out = [BloomFilter(n_bits, k) for n_bits, k in params]
    for row in rows:
        for i, f in enumerate(out):
            f.merge_words(row[i])
    return out


def apply_blooms(
    df: DataFrame,
    filters: Sequence[Tuple[Sequence[str], BloomFilter]],
) -> DataFrame:
    """``df`` restricted to rows passing *every* filter, in one
    vectorized pass (LIP-style combined application, §3.2): the key
    columns cross the Arrow boundary once regardless of the number of
    received filters; hashes are shared across filters with identical
    key sets. Bit arrays ride to executors inside the serialized UDF
    closure; ``np.frombuffer`` reconstructs them zero-copy per batch.
    """
    if not filters:
        return df
    payload = [
        (tuple(cols), b.n_bits, b.n_hashes, b.to_bytes()) for cols, b in filters
    ]
    all_cols: list[str] = []
    for cols, *_ in payload:
        for c in cols:
            if c not in all_cols:
                all_cols.append(c)

    @pandas_udf("boolean")
    def probe(keys: pd.DataFrame) -> pd.Series:
        hashed: dict = {}
        mask = np.ones(len(keys), dtype=bool)
        for cols, n_bits, n_hashes, raw in payload:
            if cols not in hashed:
                hashed[cols] = mix64(combine_columns([keys[c] for c in cols]))
            f = BloomFilter(n_bits, n_hashes, np.frombuffer(raw, dtype=np.uint64))
            mask &= f.contains_hashed(hashed[cols])
        return pd.Series(mask)

    return df.filter(probe(F.struct(*[F.col(c).alias(c) for c in all_cols])))


def bloom_filter_df(df: DataFrame, cols: Sequence[str], bloom: BloomFilter) -> DataFrame:
    """``df`` restricted to rows whose key passes ``bloom``."""
    return apply_blooms(df, [(tuple(cols), bloom)])
