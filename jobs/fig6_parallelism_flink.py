"""Reproduce Fig. 6 (as a table) — final total operator parallelism per
method when the source rate reaches 10·W_u, on the Flink simulator.

Usage: spark-submit jobs/fig6_parallelism_flink.py [--perms 6] [--local]
"""
import sys

sys.path.insert(0, "jobs")
from _common import eval_args, make_run  # noqa: E402

from repro.tables import fig6_parallelism  # noqa: E402

if __name__ == "__main__":
    args = eval_args(__doc__)
    run = make_run(args)
    print("\nFig. 6 — total parallelism @10·W_u:")
    print(fig6_parallelism(run).to_string(index=False))
