"""Benchmark fixtures: SF≈0.1 TPC-H-lite (override with REPRO_BENCH_SF).

Benchmarks keep the root conftest's 64 shuffle partitions so shuffle
paths are actually exercised at this scale.
"""
import os

import pytest

from repro import tpch

SF_BENCH = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="session")
def tpch_bench(spark):
    data = tpch.generate(spark, sf=SF_BENCH)
    yield data
    data.unpersist()
