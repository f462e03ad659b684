"""Fig 6: ROC of NSLD vs the weighted set-based fuzzy measures
(FJaccard, FCosine, FDice of [67]) when predicting whether an account is
fraudulent from the distance between its old and new names.

Paper observation to reproduce in shape: NSLD dominates all three
set-based fuzzy measures (highest ROC; here summarised as AUC plus TPR
at fixed FPR operating points).

Usage: spark-submit jobs/fig6_roc.py [--n 10000] [--delta 0.8]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import fig6_table  # noqa: E402


def run(spark, *, n=10_000, seed=11, delta=0.8):
    return fig6_table(spark, n=n, seed=seed, delta=delta)


def main(argv=None):
    p = base_parser(__doc__, n_default=10_000)
    p.add_argument("--delta", type=float, default=0.8,
                   help="token-similarity threshold T1 of [67]")
    a = p.parse_args(argv)
    spark = get_spark("fig6")
    emit("fig6_roc", run(spark, n=a.n, seed=a.seed, delta=a.delta))


if __name__ == "__main__":
    main()
