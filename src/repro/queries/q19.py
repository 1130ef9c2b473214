"""TPC-H Q19 (lite): discounted revenue — one equi edge (partkey) plus
a disjunction of three brackets mixing part and lineitem attributes.
The bracket disjunction stays a post-join filter; the per-table
implications (derivable by any optimizer) become local predicates so
the transfer phase has something to transfer."""
from pyspark.sql import Column, functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import revenue

#: (brand, container prefix, qty_lo, qty_hi, size_hi)
BRACKETS = (
    ("Brand#12", "SM", 1, 15, 10),
    ("Brand#23", "MED", 10, 25, 20),
    ("Brand#34", "LG", 20, 35, 30),
)


def _containers(prefix: str) -> list:
    return [f"{prefix} {shape}" for shape in ("CASE", "BOX", "BAG", "PACK")]


def _bracket(brand: str, prefix: str, qlo: int, qhi: int, shi: int) -> Column:
    return (
        (F.col("p_brand") == brand)
        & F.col("p_container").isin(_containers(prefix))
        & F.col("l_quantity").between(qlo, qhi)
        & F.col("p_size").between(1, shi)
    )


def _part_local() -> Column:
    cond = None
    for brand, prefix, _, _, shi in BRACKETS:
        c = (
            (F.col("p_brand") == brand)
            & F.col("p_container").isin(_containers(prefix))
            & F.col("p_size").between(1, shi)
        )
        cond = c if cond is None else (cond | c)
    return cond


def _finalize(df, scalars):
    cond = None
    for b in BRACKETS:
        c = _bracket(*b)
        cond = c if cond is None else (cond | c)
    return df.filter(cond).agg(F.sum(revenue()).alias("revenue"))


def _sql_bracket(brand, prefix, qlo, qhi, shi) -> str:
    conts = ", ".join(f"'{c}'" for c in _containers(prefix))
    return (
        f"(p_brand = '{brand}' AND p_container IN ({conts}) "
        f"AND l_quantity BETWEEN {qlo} AND {qhi} AND p_size BETWEEN 1 AND {shi})"
    )


def spec(d) -> QuerySpec:
    qlo = min(b[2] for b in BRACKETS)
    qhi = max(b[3] for b in BRACKETS)
    return QuerySpec(
        name="q19",
        tables={
            "lineitem": TableRef(
                df=d["lineitem"], predicate=F.col("l_quantity").between(qlo, qhi)
            ),
            "part": TableRef(df=d["part"], predicate=_part_local()),
        },
        edges=[Edge("part", ("p_partkey",), "lineitem", ("l_partkey",))],
        join_order=["lineitem", "part"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT SUM(l_extendedprice * (1 - l_discount)) AS revenue
            FROM lineitem, part
            WHERE p_partkey = l_partkey
              AND ({" OR ".join(_sql_bracket(*b) for b in BRACKETS)})
        """,
    )
