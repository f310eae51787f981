"""PQP query templates as Spark DataFrame pipelines over TPC-H-lite.

ZeroTune's PQP workload is synthetic (linear chains, multi-way windowed
joins, chained filters). We realise the three template families as
concrete, oracle-checkable batch pipelines over the TPC-H-lite tables,
with tumbling windows expressed as day-bucketed event time
(``floor(days_since_epoch / window_days)``). The *logical DAG shapes*
match `repro.sim.workloads.pqp_catalogue` (filters → windowed join(s) →
windowed aggregate).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

EPOCH = "1992-01-01"
WINDOW_DAYS = 30


def _window(col: str) -> F.Column:
    return F.floor(F.datediff(F.col(col), F.lit(EPOCH).cast("date")) / WINDOW_DAYS).cast("long")


LINEAR_SQL = f"""
SELECT CAST(floor(datediff('day', DATE '{EPOCH}', l_shipdate) / {WINDOW_DAYS}) AS BIGINT) AS w,
       round(sum(l_extendedprice), 2) AS revenue,
       count(*) AS n
FROM lineitem
WHERE l_quantity < 25 AND l_discount > 0.02
GROUP BY 1
"""


def linear(lineitem: DataFrame) -> DataFrame:
    """Linear template: source → filter → filter → tumbling window agg."""
    return (
        lineitem.where(F.col("l_quantity") < 25)
        .where(F.col("l_discount") > 0.02)
        .groupBy(_window("l_shipdate").alias("w"))
        .agg(
            F.round(F.sum("l_extendedprice"), 2).alias("revenue"),
            F.count("*").alias("n"),
        )
    )


TWO_WAY_SQL = f"""
SELECT CAST(floor(datediff('day', DATE '{EPOCH}', o_orderdate) / {WINDOW_DAYS}) AS BIGINT) AS w,
       round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue,
       count(*) AS n
FROM lineitem JOIN orders ON l_orderkey = o_orderkey
WHERE l_quantity < 30 AND o_orderstatus = 'O'
GROUP BY 1
"""


def two_way_join(lineitem: DataFrame, orders: DataFrame) -> DataFrame:
    """2-way template: two filtered sources → windowed join → window agg."""
    li = lineitem.where(F.col("l_quantity") < 30)
    o = orders.where(F.col("o_orderstatus") == "O")
    return (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .groupBy(_window("o_orderdate").alias("w"))
        .agg(
            F.round(
                F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2
            ).alias("revenue"),
            F.count("*").alias("n"),
        )
    )


THREE_WAY_SQL = f"""
SELECT c_mktsegment AS segment,
       CAST(floor(datediff('day', DATE '{EPOCH}', o_orderdate) / {WINDOW_DAYS}) AS BIGINT) AS w,
       round(sum(l_extendedprice * (1 - l_discount)), 2) AS revenue
FROM lineitem
JOIN orders ON l_orderkey = o_orderkey
JOIN customer ON o_custkey = c_custkey
WHERE l_discount > 0.01 AND o_totalprice > 50000 AND c_acctbal > 0
GROUP BY 1, 2
"""


def three_way_join(
    lineitem: DataFrame, orders: DataFrame, customer: DataFrame
) -> DataFrame:
    """3-way template: three filtered sources → join → join → window agg."""
    li = lineitem.where(F.col("l_discount") > 0.01)
    o = orders.where(F.col("o_totalprice") > 50000)
    c = customer.where(F.col("c_acctbal") > 0)
    return (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .join(c, o["o_custkey"] == c["c_custkey"])
        .groupBy(
            F.col("c_mktsegment").alias("segment"),
            _window("o_orderdate").alias("w"),
        )
        .agg(
            F.round(
                F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2
            ).alias("revenue"),
        )
    )
