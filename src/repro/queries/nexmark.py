"""Nexmark queries Q1, Q2, Q3, Q5, Q8 as Spark DataFrame pipelines.

These are the micro-batch analogues of the streaming jobs whose logical
DAGs `repro.sim.workloads` tunes: Q1/Q2 stateless map/filter, Q3 an
incremental two-input join, Q5 a sliding-window aggregation (hot items),
Q8 a tumbling-window join. Each function returns a DataFrame and exposes
the DuckDB SQL that must produce identical rows (checked by
``repro.oracle.assert_equivalent`` in tests).

Window analogues: event times are integer seconds; Q5 uses 60 s windows
sliding by 10 s (a bid belongs to 6 windows, realised via an exploded
slide-index sequence); Q8 uses 10 s tumbling windows.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Q1 currency conversion factor (USD → EUR), from the Nexmark spec.
Q1_EXCHANGE_RATE = 0.908

Q1_SQL = f"""
SELECT auction, bidder, round(price * {Q1_EXCHANGE_RATE}, 2) AS price_eur,
       date_time
FROM bids
"""


def q1(bids: DataFrame) -> DataFrame:
    """Currency conversion — stateless map over every bid."""
    return bids.select(
        "auction",
        "bidder",
        F.round(F.col("price") * F.lit(Q1_EXCHANGE_RATE), 2).alias("price_eur"),
        "date_time",
    )


Q2_SQL = """
SELECT auction, price FROM bids WHERE auction % 123 = 0
"""


def q2(bids: DataFrame) -> DataFrame:
    """Selection — stateless filter on a subset of auctions."""
    return bids.where(F.col("auction") % 123 == 0).select("auction", "price")


Q3_SQL = """
SELECT p.name AS name, p.city AS city, p.state AS state, a.id AS auction_id
FROM auctions a JOIN persons p ON a.seller = p.id
WHERE a.category = 10 AND p.state IN ('OR', 'ID', 'CA')
"""


def q3(auctions: DataFrame, persons: DataFrame) -> DataFrame:
    """Local item suggestion — incremental two-input join."""
    a = auctions.where(F.col("category") == 10)
    p = persons.where(F.col("state").isin("OR", "ID", "CA"))
    return (
        a.join(p, a["seller"] == p["id"])
        .select(
            p["name"].alias("name"),
            p["city"].alias("city"),
            p["state"].alias("state"),
            a["id"].alias("auction_id"),
        )
    )


Q5_SQL = """
WITH wb AS (
    SELECT auction,
           unnest(generate_series(CAST(floor(date_time / 10) AS BIGINT) - 5,
                                  CAST(floor(date_time / 10) AS BIGINT))) AS w
    FROM bids
),
wf AS (SELECT * FROM wb WHERE w >= 0),
counts AS (SELECT w, auction, count(*) AS cnt FROM wf GROUP BY w, auction),
maxc AS (SELECT w, max(cnt) AS max_cnt FROM counts GROUP BY w)
SELECT c.w AS window_slide, c.auction AS auction, c.cnt AS cnt
FROM counts c JOIN maxc m ON c.w = m.w AND c.cnt = m.max_cnt
"""


def q5(bids: DataFrame) -> DataFrame:
    """Hot items — per-sliding-window bid counts, keep the max. 60 s
    windows sliding by 10 s: slide index w covers [10w, 10w + 60)."""
    slide_hi = F.floor(F.col("date_time") / 10).cast("long")
    wb = (
        bids.withColumn("w", F.explode(F.sequence(slide_hi - F.lit(5), slide_hi)))
        .where(F.col("w") >= 0)
    )
    counts = wb.groupBy("w", "auction").agg(F.count("*").alias("cnt"))
    maxc = counts.groupBy("w").agg(F.max("cnt").alias("max_cnt"))
    return (
        counts.join(maxc, "w")
        .where(F.col("cnt") == F.col("max_cnt"))
        .select(F.col("w").alias("window_slide"), "auction", "cnt")
    )


Q8_SQL = """
SELECT p.id AS person_id, p.name AS name,
       CAST(floor(p.date_time / 10) AS BIGINT) AS window_start
FROM persons p JOIN auctions a
  ON p.id = a.seller
 AND CAST(floor(p.date_time / 10) AS BIGINT) = CAST(floor(a.date_time / 10) AS BIGINT)
GROUP BY 1, 2, 3
"""


def q8(persons: DataFrame, auctions: DataFrame) -> DataFrame:
    """Monitor new users — tumbling-window join of persons who created
    auctions within the same 10 s window."""
    p = persons.withColumn("window_start", F.floor(F.col("date_time") / 10).cast("long"))
    a = auctions.withColumn("window_start", F.floor(F.col("date_time") / 10).cast("long"))
    return (
        p.join(
            a,
            (p["id"] == a["seller"]) & (p["window_start"] == a["window_start"]),
        )
        .select(
            p["id"].alias("person_id"),
            p["name"].alias("name"),
            p["window_start"].alias("window_start"),
        )
        .distinct()
    )
