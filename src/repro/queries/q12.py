"""TPC-H Q12 (lite): shipping modes and order priority — a 2-table
query where the paper expects *small* gains from predicate transfer
(one hop already reaches everything, §4.2)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import between_dates

MODES = ("MAIL", "SHIP")
DATE_LO, DATE_HI = "1994-01-01", "1995-01-01"

_HIGH = ("1-URGENT", "2-HIGH")


def _finalize(df, scalars):
    is_high = F.col("o_orderpriority").isin(*_HIGH)
    return df.groupBy("l_shipmode").agg(
        F.sum(F.when(is_high, 1).otherwise(0)).alias("high_line_count"),
        F.sum(F.when(is_high, 0).otherwise(1)).alias("low_line_count"),
    )


def spec(d) -> QuerySpec:
    li_pred = (
        F.col("l_shipmode").isin(*MODES)
        & (F.col("l_commitdate") < F.col("l_receiptdate"))
        & (F.col("l_shipdate") < F.col("l_commitdate"))
        & between_dates("l_receiptdate", DATE_LO, DATE_HI)
    )
    return QuerySpec(
        name="q12",
        tables={
            "orders": TableRef(df=d["orders"]),
            "lineitem": TableRef(df=d["lineitem"], predicate=li_pred),
        },
        edges=[Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",))],
        join_order=["lineitem", "orders"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT l_shipmode,
                   SUM(CASE WHEN o_orderpriority IN ('1-URGENT', '2-HIGH')
                            THEN 1 ELSE 0 END) AS high_line_count,
                   SUM(CASE WHEN o_orderpriority IN ('1-URGENT', '2-HIGH')
                            THEN 0 ELSE 1 END) AS low_line_count
            FROM orders, lineitem
            WHERE o_orderkey = l_orderkey
              AND l_shipmode IN ('MAIL', 'SHIP')
              AND l_commitdate < l_receiptdate AND l_shipdate < l_commitdate
              AND l_receiptdate >= TIMESTAMP '{DATE_LO}'
              AND l_receiptdate < TIMESTAMP '{DATE_HI}'
            GROUP BY l_shipmode
        """,
    )
