"""Operator-cost calibration from real Spark micro-batch execution.

The simulator's base rates (`engine.BASE_RATE`) are analytic constants.
This module grounds them: it executes each logical operator type as an
actual Spark DataFrame transformation over a generated micro-batch at
several ``repartition(p)`` settings, measures records/second, and fits
the engine's PA curve ``PA(p) = base · p / (1 + κ (p − 1))`` by least
squares. On a `local[*]` session the absolute numbers reflect this
machine, not the paper's Xeon testbed — what matters (and what the test
asserts) is the *shape*: throughput grows sub-linearly with partition
count, exactly the curve family the engine assumes and the paper's
Fig. 4 measures.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def _micro_batch(spark: SparkSession, n_rows: int, seed: int = 0) -> DataFrame:
    return (
        spark.range(n_rows)
        .withColumn("k", (F.col("id") * 2654435761 % 10_000).cast("long"))
        .withColumn("v", F.rand(seed))
        .withColumn("t", (F.col("id") % 3600).cast("long"))
    )


def _apply_operator(df: DataFrame, op_type: str) -> DataFrame:
    """The micro-batch analogue of each logical operator type."""
    if op_type == "map":
        return df.withColumn("v2", F.col("v") * 0.908 + 1.0)
    if op_type == "filter":
        return df.where(F.col("v") > 0.5)
    if op_type == "flatmap":
        return df.withColumn("e", F.explode(F.array(F.col("v"), F.col("v") * 2)))
    if op_type == "aggregate":
        return df.groupBy("k").agg(F.sum("v").alias("s"))
    if op_type == "window_agg":
        return df.groupBy("k", (F.col("t") / 10).cast("long").alias("w")).agg(
            F.count("*").alias("c"), F.avg("v").alias("a")
        )
    if op_type in ("join", "window_join"):
        other = df.select(F.col("k").alias("k2"), F.col("v").alias("v2"))
        cond = df["k"] == other["k2"]
        return df.join(other.groupBy("k2").agg(F.max("v2").alias("m")), cond)
    raise ValueError(f"no micro-batch analogue for {op_type!r}")


@dataclass
class CalibrationPoint:
    op_type: str
    partitions: int
    records_per_sec: float


@dataclass
class CalibrationCurve:
    op_type: str
    base: float  # records/s at p=1
    kappa: float  # scaling friction
    points: list[CalibrationPoint]


def measure_operator(
    spark: SparkSession,
    op_type: str,
    *,
    n_rows: int = 200_000,
    partitions: tuple[int, ...] = (1, 2, 4, 8),
    repeats: int = 2,
    seed: int = 0,
) -> list[CalibrationPoint]:
    """Throughput of one operator type at several parallelism degrees."""
    points: list[CalibrationPoint] = []
    base_df = _micro_batch(spark, n_rows, seed).cache()
    base_df.count()  # materialise input outside the timed region
    try:
        for p in partitions:
            df = _apply_operator(base_df.repartition(p), op_type)
            df.count()  # warm-up run (plan compilation, shuffles)
            best = 0.0
            for _ in range(repeats):
                t0 = time.perf_counter()
                df.count()
                dt = time.perf_counter() - t0
                best = max(best, n_rows / max(dt, 1e-6))
            points.append(CalibrationPoint(op_type, p, best))
    finally:
        base_df.unpersist()
    return points


def fit_curve(points: list[CalibrationPoint]) -> CalibrationCurve:
    """Least-squares fit of ``rate(p) = base · p / (1 + κ (p − 1))`` over
    a (base, κ) grid — 2 parameters, tiny domain, grid search is exact
    enough and dependency-free."""
    ps = np.array([pt.partitions for pt in points], dtype=float)
    rs = np.array([pt.records_per_sec for pt in points], dtype=float)
    base0 = rs[ps == ps.min()][0]
    best = (base0, 0.0, np.inf)
    for base in np.linspace(0.5 * base0, 2.0 * base0, 40):
        for kappa in np.linspace(0.0, 0.9, 46):
            pred = base * ps / (1.0 + kappa * (ps - 1.0))
            err = float(((pred - rs) / rs.max()) ** 2 @ np.ones_like(rs))
            if err < best[2]:
                best = (float(base), float(kappa), err)
    return CalibrationCurve(points[0].op_type, best[0], best[1], points)


def calibrate(
    spark: SparkSession,
    op_types: tuple[str, ...] = ("map", "filter", "aggregate"),
    **kw,
) -> dict[str, CalibrationCurve]:
    """Calibration curves for several operator types."""
    return {t: fit_curve(measure_operator(spark, t, **kw)) for t in op_types}
