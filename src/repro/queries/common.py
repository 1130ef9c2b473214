"""Shared expressions for the TPC-H-lite query specs."""
from pyspark.sql import Column
from pyspark.sql import functions as F


def revenue() -> Column:
    """The TPC-H revenue term ``l_extendedprice * (1 - l_discount)``."""
    return F.col("l_extendedprice") * (1 - F.col("l_discount"))


def between_dates(col: str, lo: str, hi: str) -> Column:
    """Half-open date-range predicate ``lo <= col < hi``."""
    return (F.col(col) >= lo) & (F.col(col) < hi)
