"""TPC-H Q4 (lite): order-priority checking — an EXISTS sub-plan
modelled as a SEMI edge (orders ⋉ late lineitems). Transfer is legal in
both directions across a semi edge: dropping an orders row whose key is
absent from lineitem only removes a row the semi-join would drop
anyway, and vice versa."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import between_dates

DATE_LO, DATE_HI = "1993-07-01", "1993-10-01"


def _finalize(df, scalars):
    return df.groupBy("o_orderpriority").agg(F.count(F.lit(1)).alias("order_count"))


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q04",
        tables={
            "orders": TableRef(
                df=d["orders"], predicate=between_dates("o_orderdate", DATE_LO, DATE_HI)
            ),
            "lineitem": TableRef(
                df=d["lineitem"],
                predicate=F.col("l_commitdate") < F.col("l_receiptdate"),
            ),
        },
        edges=[
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",), how="semi"),
        ],
        join_order=["orders", "lineitem"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT o_orderpriority, COUNT(*) AS order_count
            FROM orders
            WHERE o_orderdate >= TIMESTAMP '{DATE_LO}'
              AND o_orderdate < TIMESTAMP '{DATE_HI}'
              AND EXISTS (
                SELECT 1 FROM lineitem
                WHERE l_orderkey = o_orderkey AND l_commitdate < l_receiptdate)
            GROUP BY o_orderpriority
        """,
    )
