"""TPC-H Q18 (lite): large-volume customers. The IN sub-query (orders
whose lineitems sum past a quantity threshold) is a single-table
group-by executed first; its tiny key set joins the main graph via a
SEMI edge on orders — under full transfer its orderkey filter reaches
lineitem and (via orders) customer, the paper's stated reason for
Q18's 7-40× band."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, SubQuery, TableRef

THRESHOLD = 200  # lite data has ~4 lines/order ⇒ lower than dbgen's 300

_SUB_SQL_BODY = f"""
    SELECT l_orderkey AS bo_orderkey
    FROM lineitem GROUP BY l_orderkey
    HAVING SUM(l_quantity) > {THRESHOLD}
"""


def _sub_spec(d) -> QuerySpec:
    return QuerySpec(
        name="q18_bigorders",
        tables={"lineitem": TableRef(df=d["lineitem"])},
        edges=[],
        join_order=["lineitem"],
        finalize=lambda df, s: df.groupBy("l_orderkey")
        .agg(F.sum("l_quantity").alias("qty"))
        .filter(F.col("qty") > THRESHOLD)
        .select(F.col("l_orderkey").alias("bo_orderkey")),
    )


def _finalize(df, scalars):
    return df.groupBy("c_custkey", "o_orderkey", "o_totalprice").agg(
        F.sum("l_quantity").alias("sum_qty")
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q18",
        tables={
            "customer": TableRef(df=d["customer"]),
            "orders": TableRef(df=d["orders"]),
            "lineitem": TableRef(df=d["lineitem"]),
            "bigorders": TableRef(subquery="bigorders"),
        },
        edges=[
            Edge("customer", ("c_custkey",), "orders", ("o_custkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("orders", ("o_orderkey",), "bigorders", ("bo_orderkey",), how="semi"),
        ],
        join_order=["lineitem", "orders", "bigorders", "customer"],
        finalize=_finalize,
        subqueries=[SubQuery(name="bigorders", spec=_sub_spec(d))],
        oracle_sql=f"""
            SELECT c_custkey, o_orderkey, o_totalprice,
                   SUM(l_quantity) AS sum_qty
            FROM customer, orders, lineitem
            WHERE o_orderkey IN ({_SUB_SQL_BODY})
              AND c_custkey = o_custkey AND o_orderkey = l_orderkey
            GROUP BY c_custkey, o_orderkey, o_totalprice
        """,
    )
