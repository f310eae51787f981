"""Shared helpers for spark-submit entrypoints."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def eval_args(description: str) -> argparse.Namespace:
    ap = argparse.ArgumentParser(description=description)
    ap.add_argument(
        "--perms",
        type=int,
        default=6,
        help="permutations of the 20-rate cycle (6 = the paper's 120 changes)",
    )
    ap.add_argument(
        "--pqp-per-group", type=int, default=2,
        help="PQP queries evaluated per template group (counts are scaled)",
    )
    ap.add_argument("--history", type=int, default=250, help="deployments per workload in the pre-training history")
    ap.add_argument("--model", default="xgboost", choices=["svm", "xgboost", "nn"], help="StreamTune fine-tune layer")
    ap.add_argument("--seed", type=int, default=3)
    ap.add_argument("--local", action="store_true", help="skip Spark (pure-local history generation)")
    return ap.parse_args()


def make_run(args):
    from repro.tables import EvalConfig, run_flink_evaluation

    spark = None if args.local else get_spark("repro-eval")
    cfg = EvalConfig(
        pattern_perms=args.perms,
        pqp_per_group=args.pqp_per_group,
        history_per_workload=args.history,
        model_kind=args.model,
        seed=args.seed,
    )
    return run_flink_evaluation(cfg, spark=spark, verbose=True)
