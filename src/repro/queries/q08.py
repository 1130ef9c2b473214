"""TPC-H Q8 (lite): national market share — eight tables including two
*aliases* of nation (customer's nation, filtered through region; the
supplier's nation, kept for the CASE aggregate). Aliases are distinct
spec tables with renamed columns (``n1_*`` / ``n2_*``)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef, rename_prefix
from repro.queries.common import revenue

REGION = "AMERICA"
NATION = "BRAZIL"
TYPE = "ECONOMY"
DATE_LO, DATE_HI = "1995-01-01", "1997-01-01"


def _finalize(df, scalars):
    vol = revenue()
    return (
        df.withColumn("o_year", F.year("o_orderdate"))
        .groupBy("o_year")
        .agg(
            (
                F.sum(F.when(F.col("n2_name") == NATION, vol).otherwise(F.lit(0.0)))
                / F.sum(vol)
            ).alias("mkt_share")
        )
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q08",
        tables={
            "part": TableRef(df=d["part"], predicate=F.col("p_type") == TYPE),
            "supplier": TableRef(df=d["supplier"]),
            "lineitem": TableRef(df=d["lineitem"]),
            "orders": TableRef(
                df=d["orders"],
                predicate=(F.col("o_orderdate") >= DATE_LO)
                & (F.col("o_orderdate") < DATE_HI),
            ),
            "customer": TableRef(df=d["customer"]),
            "n1": TableRef(df=rename_prefix(d["nation"], "n_", "n1_")),
            "n2": TableRef(df=rename_prefix(d["nation"], "n_", "n2_")),
            "region": TableRef(df=d["region"], predicate=F.col("r_name") == REGION),
        },
        edges=[
            Edge("part", ("p_partkey",), "lineitem", ("l_partkey",)),
            Edge("supplier", ("s_suppkey",), "lineitem", ("l_suppkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("customer", ("c_custkey",), "orders", ("o_custkey",)),
            Edge("n1", ("n1_nationkey",), "customer", ("c_nationkey",)),
            Edge("region", ("r_regionkey",), "n1", ("n1_regionkey",)),
            Edge("n2", ("n2_nationkey",), "supplier", ("s_nationkey",)),
        ],
        join_order=[
            "lineitem",
            "part",
            "supplier",
            "orders",
            "customer",
            "n1",
            "region",
            "n2",
        ],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT EXTRACT(year FROM o_orderdate)::INT AS o_year,
                   SUM(CASE WHEN n2.n_name = '{NATION}'
                            THEN l_extendedprice * (1 - l_discount) ELSE 0 END)
                   / SUM(l_extendedprice * (1 - l_discount)) AS mkt_share
            FROM part, supplier, lineitem, orders, customer,
                 nation n1, nation n2, region
            WHERE p_partkey = l_partkey AND s_suppkey = l_suppkey
              AND l_orderkey = o_orderkey AND o_custkey = c_custkey
              AND c_nationkey = n1.n_nationkey AND n1.n_regionkey = r_regionkey
              AND s_nationkey = n2.n_nationkey
              AND r_name = '{REGION}' AND p_type = '{TYPE}'
              AND o_orderdate >= TIMESTAMP '{DATE_LO}'
              AND o_orderdate < TIMESTAMP '{DATE_HI}'
            GROUP BY 1
        """,
    )
