"""Reproduce Fig. 7a/7b (as tables) — average reconfigurations per
tuning process and StreamTune tuning-time distribution.

Usage: spark-submit jobs/fig7_reconfigurations.py [--perms 6] [--local]
"""
import sys

sys.path.insert(0, "jobs")
from _common import eval_args, make_run  # noqa: E402

from repro.tables import fig7_reconfigurations, fig7b_tuning_minutes  # noqa: E402

if __name__ == "__main__":
    args = eval_args(__doc__)
    run = make_run(args)
    print("\nFig. 7a — average reconfigurations per tuning process:")
    print(fig7_reconfigurations(run).to_string(index=False))
    print("\nFig. 7b — StreamTune tuning time (virtual minutes):")
    print(fig7b_tuning_minutes(run).to_string(index=False))
