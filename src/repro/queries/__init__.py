"""TPC-H-lite query suite: the 14 multi-join queries of the paper's
evaluation that are expressible on the lite schema (the paper excludes
Q1/Q6 — no joins; Q7/Q13/Q15/Q16/Q20/Q22 need text columns that add no
new join-graph shape — see DESIGN.md §substitutions).

Each module exposes ``spec(tables) -> QuerySpec`` where ``tables`` maps
base-table names to Spark DataFrames (``repro.tpch.generate(...)``'s
``.spark``). Every spec carries its DuckDB oracle SQL.
"""
from typing import Callable, Dict, Mapping

from pyspark.sql import DataFrame

from repro.core.spec import QuerySpec
from repro.queries import (
    q02,
    q03,
    q04,
    q05,
    q08,
    q09,
    q10,
    q11,
    q12,
    q14,
    q17,
    q18,
    q19,
    q21,
)

QUERIES: Dict[str, Callable[[Mapping[str, DataFrame]], QuerySpec]] = {
    "q02": q02.spec,
    "q03": q03.spec,
    "q04": q04.spec,
    "q05": q05.spec,
    "q08": q08.spec,
    "q09": q09.spec,
    "q10": q10.spec,
    "q11": q11.spec,
    "q12": q12.spec,
    "q14": q14.spec,
    "q17": q17.spec,
    "q18": q18.spec,
    "q19": q19.spec,
    "q21": q21.spec,
}

ALL = sorted(QUERIES)


def build(name: str, tables: Mapping[str, DataFrame]) -> QuerySpec:
    """Instantiate query ``name`` over ``tables``."""
    return QUERIES[name](tables)
