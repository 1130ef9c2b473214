"""TPC-H Q5 (lite) — the paper's running example (Figure 1, Table 1).

Six tables, cyclic join graph: the ``c_nationkey = s_nationkey``
equality class {customer, supplier, nation} is fully connected, exactly
as drawn in Figure 1a. Local predicates on region (``r_name='ASIA'``)
and orders (1994 order dates).

``JOIN_ORDERS`` provides the default left-deep order (reconstructed
from Table 1's HT/PR counts: lineitem ⋈ supplier ⋈ orders ⋈ customer ⋈
nation ⋈ region) plus two alternatives for the Figure-4 robustness
experiment.
"""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import between_dates, revenue

REGION = "ASIA"
DATE_LO, DATE_HI = "1994-01-01", "1995-01-01"

#: Figure 4: three join orders. All derive their join conditions from the
#: same edge set, so only the order differs.
JOIN_ORDERS = {
    "order1": ["lineitem", "supplier", "orders", "customer", "nation", "region"],
    "order2": ["customer", "orders", "lineitem", "supplier", "nation", "region"],
    "order3": ["region", "nation", "supplier", "lineitem", "orders", "customer"],
}


def _finalize(df, scalars):
    return df.groupBy("n_name").agg(F.sum(revenue()).alias("revenue"))


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q05",
        tables={
            "customer": TableRef(df=d["customer"]),
            "orders": TableRef(
                df=d["orders"], predicate=between_dates("o_orderdate", DATE_LO, DATE_HI)
            ),
            "lineitem": TableRef(df=d["lineitem"]),
            "supplier": TableRef(df=d["supplier"]),
            "nation": TableRef(df=d["nation"]),
            "region": TableRef(df=d["region"], predicate=F.col("r_name") == REGION),
        },
        edges=[
            Edge("supplier", ("s_suppkey",), "lineitem", ("l_suppkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("customer", ("c_custkey",), "orders", ("o_custkey",)),
            Edge("customer", ("c_nationkey",), "supplier", ("s_nationkey",)),
            Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
            Edge("nation", ("n_nationkey",), "customer", ("c_nationkey",)),
            Edge("region", ("r_regionkey",), "nation", ("n_regionkey",)),
        ],
        join_order=JOIN_ORDERS["order1"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT n_name, SUM(l_extendedprice * (1 - l_discount)) AS revenue
            FROM customer, orders, lineitem, supplier, nation, region
            WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
              AND l_suppkey = s_suppkey AND c_nationkey = s_nationkey
              AND s_nationkey = n_nationkey AND n_regionkey = r_regionkey
              AND r_name = '{REGION}'
              AND o_orderdate >= TIMESTAMP '{DATE_LO}'
              AND o_orderdate < TIMESTAMP '{DATE_HI}'
            GROUP BY n_name
        """,
    )
