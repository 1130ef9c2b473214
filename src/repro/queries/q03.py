"""TPC-H Q3 (lite): shipping-priority join of customer, orders,
lineitem — all three carry local predicates, which is why the paper
reports a 10× Pred-Trans win here: one-hop Bloom join can transfer only
a subset of them, full transfer reaches every table (§4.2)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import revenue

SEGMENT = "BUILDING"
DATE = "1995-03-15"


def _finalize(df, scalars):
    return df.groupBy("l_orderkey").agg(F.sum(revenue()).alias("revenue"))


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q03",
        tables={
            "customer": TableRef(
                df=d["customer"], predicate=F.col("c_mktsegment") == SEGMENT
            ),
            "orders": TableRef(df=d["orders"], predicate=F.col("o_orderdate") < DATE),
            "lineitem": TableRef(df=d["lineitem"], predicate=F.col("l_shipdate") > DATE),
        },
        edges=[
            Edge("customer", ("c_custkey",), "orders", ("o_custkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
        ],
        join_order=["lineitem", "orders", "customer"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT l_orderkey, SUM(l_extendedprice * (1 - l_discount)) AS revenue
            FROM customer, orders, lineitem
            WHERE c_mktsegment = '{SEGMENT}' AND c_custkey = o_custkey
              AND l_orderkey = o_orderkey
              AND o_orderdate < TIMESTAMP '{DATE}'
              AND l_shipdate > TIMESTAMP '{DATE}'
            GROUP BY l_orderkey
        """,
    )
