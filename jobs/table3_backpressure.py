"""Reproduce Table III — frequency of backpressure occurrences per
method during tuning over the periodic source-rate pattern (Flink sim).

Usage: spark-submit jobs/table3_backpressure.py [--perms 6] [--local]
"""
import sys

sys.path.insert(0, "jobs")
from _common import eval_args, make_run  # noqa: E402

from repro.tables import table3_backpressure  # noqa: E402

if __name__ == "__main__":
    args = eval_args(__doc__)
    run = make_run(args)
    print("\nTable III — backpressure occurrences "
          f"({20 * args.perms} rate changes/query; PQP scaled to full groups):")
    print(table3_backpressure(run).to_string(index=False))
