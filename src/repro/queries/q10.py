"""TPC-H Q10 (lite): returned-item reporting — customer ⋈ orders ⋈
lineitem ⋈ nation with local predicates on orders (quarter) and
lineitem (returnflag)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import between_dates, revenue

DATE_LO, DATE_HI = "1993-10-01", "1994-01-01"
FLAG = "R"


def _finalize(df, scalars):
    return df.groupBy("c_custkey", "n_name").agg(F.sum(revenue()).alias("revenue"))


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q10",
        tables={
            "customer": TableRef(df=d["customer"]),
            "orders": TableRef(
                df=d["orders"], predicate=between_dates("o_orderdate", DATE_LO, DATE_HI)
            ),
            "lineitem": TableRef(df=d["lineitem"], predicate=F.col("l_returnflag") == FLAG),
            "nation": TableRef(df=d["nation"]),
        },
        edges=[
            Edge("customer", ("c_custkey",), "orders", ("o_custkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("nation", ("n_nationkey",), "customer", ("c_nationkey",)),
        ],
        join_order=["lineitem", "orders", "customer", "nation"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT c_custkey, n_name,
                   SUM(l_extendedprice * (1 - l_discount)) AS revenue
            FROM customer, orders, lineitem, nation
            WHERE c_custkey = o_custkey AND l_orderkey = o_orderkey
              AND c_nationkey = n_nationkey AND l_returnflag = '{FLAG}'
              AND o_orderdate >= TIMESTAMP '{DATE_LO}'
              AND o_orderdate < TIMESTAMP '{DATE_HI}'
            GROUP BY c_custkey, n_name
        """,
    )
