"""Reproduce Fig. 11 (as tables) — ablations: fine-tuning model choice
(SVM / XGBoost / NN) and similarity-center computation time.

Usage: spark-submit jobs/fig11_ablation.py [--perms 2] [--local]
"""
import sys

sys.path.insert(0, "jobs")
from _common import eval_args, make_run  # noqa: E402

from repro.tables import fig11a_models, fig11b_simcenter  # noqa: E402

if __name__ == "__main__":
    args = eval_args(__doc__)
    run = make_run(args)
    print("\nFig. 11a — fine-tuning model ablation:")
    print(fig11a_models(run).to_string(index=False))
    print("\nFig. 11b — similarity-center computation time:")
    print(fig11b_simcenter().to_string(index=False))
