"""TPC-H Q14 (lite): promotion effect — 2-table join with a scalar
result; another "one hop suffices" query per §4.2."""
from pyspark.sql import functions as F

from repro.core.spec import Edge, QuerySpec, TableRef
from repro.queries.common import between_dates, revenue

DATE_LO, DATE_HI = "1995-09-01", "1995-10-01"
PROMO = "PROMO"


def _finalize(df, scalars):
    rev = revenue()
    promo = F.when(F.col("p_type") == PROMO, rev).otherwise(F.lit(0.0))
    return df.agg((F.sum(promo) * 100.0 / F.sum(rev)).alias("promo_revenue"))


def spec(d) -> QuerySpec:
    return QuerySpec(
        name="q14",
        tables={
            "lineitem": TableRef(
                df=d["lineitem"],
                predicate=between_dates("l_shipdate", DATE_LO, DATE_HI),
            ),
            "part": TableRef(df=d["part"]),
        },
        edges=[Edge("part", ("p_partkey",), "lineitem", ("l_partkey",))],
        join_order=["lineitem", "part"],
        finalize=_finalize,
        oracle_sql=f"""
            SELECT 100.0 * SUM(CASE WHEN p_type = '{PROMO}'
                                    THEN l_extendedprice * (1 - l_discount)
                                    ELSE 0 END)
                   / SUM(l_extendedprice * (1 - l_discount)) AS promo_revenue
            FROM lineitem, part
            WHERE l_partkey = p_partkey
              AND l_shipdate >= TIMESTAMP '{DATE_LO}'
              AND l_shipdate < TIMESTAMP '{DATE_HI}'
        """,
    )
