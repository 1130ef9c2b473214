"""TPC-H Q9 (lite): product-type profit. Cyclic join graph — lineitem
joins partsupp on the *pair* (partkey, suppkey) while part and supplier
join on each key individually, so the graph contains genuine cycles
that the Yannakakis baseline must break but predicate transfer keeps
(§4.3's point about cyclic filtering power)."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef

TYPE = "PROMO"


def _finalize(df, scalars):
    amount = F.col("l_extendedprice") * (1 - F.col("l_discount")) - F.col(
        "ps_supplycost"
    ) * F.col("l_quantity")
    return (
        df.withColumn("o_year", F.year("o_orderdate"))
        .groupBy(F.col("n_name").alias("nation"), F.col("o_year"))
        .agg(F.sum(amount).alias("sum_profit"))
    )


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q09",
        tables={
            "part": TableRef(df=d["part"], predicate=F.col("p_type") == TYPE),
            "supplier": TableRef(df=d["supplier"]),
            "lineitem": TableRef(df=d["lineitem"]),
            "partsupp": TableRef(df=d["partsupp"]),
            "orders": TableRef(df=d["orders"]),
            "nation": TableRef(df=d["nation"]),
        },
        edges=[
            Edge("part", ("p_partkey",), "lineitem", ("l_partkey",)),
            Edge("supplier", ("s_suppkey",), "lineitem", ("l_suppkey",)),
            Edge(
                "partsupp",
                ("ps_partkey", "ps_suppkey"),
                "lineitem",
                ("l_partkey", "l_suppkey"),
            ),
            Edge("part", ("p_partkey",), "partsupp", ("ps_partkey",)),
            Edge("supplier", ("s_suppkey",), "partsupp", ("ps_suppkey",)),
            Edge("orders", ("o_orderkey",), "lineitem", ("l_orderkey",)),
            Edge("nation", ("n_nationkey",), "supplier", ("s_nationkey",)),
        ],
        join_order=["lineitem", "part", "partsupp", "supplier", "nation", "orders"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT n_name AS nation, EXTRACT(year FROM o_orderdate)::INT AS o_year,
                   SUM(l_extendedprice * (1 - l_discount)
                       - ps_supplycost * l_quantity) AS sum_profit
            FROM part, supplier, lineitem, partsupp, orders, nation
            WHERE s_suppkey = l_suppkey AND ps_suppkey = l_suppkey
              AND ps_partkey = l_partkey AND p_partkey = l_partkey
              AND o_orderkey = l_orderkey AND s_nationkey = n_nationkey
              AND p_type = '{TYPE}'
            GROUP BY 1, 2
        """,
    )
