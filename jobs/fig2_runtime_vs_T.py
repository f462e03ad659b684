"""Fig 2: TSJ runtime while varying the NSLD threshold T, for the three
algorithms (fuzzy-token-matching, greedy-token-aligning,
exact-token-matching), grouping-on-one-string.

Paper observations to reproduce in shape: greedy saves ~13% on average
over fuzzy (more as T grows); exact saves ~60% and is nearly flat in T.

Usage: spark-submit jobs/fig2_runtime_vs_T.py [--n 20000] [--m 100]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import PAPER_T_SWEEP, sweep_t  # noqa: E402
from repro.namegen import names_corpus  # noqa: E402


def run(spark, *, n=20_000, seed=7, m=100, ts=PAPER_T_SWEEP):
    corpus = names_corpus(spark, n=n, seed=seed)
    corpus.cache().count()
    return sweep_t(spark, corpus, m=m, ts=tuple(ts), repeats=2)


def main(argv=None):
    p = base_parser(__doc__, n_default=20_000)
    p.add_argument("--m", type=int, default=100)
    a = p.parse_args(argv)
    spark = get_spark("fig2")
    table = run(spark, n=a.n, seed=a.seed, m=a.m)
    emit("fig2_runtime_vs_T", table[["t", "variant", "runtime_s", "n_pairs"]])


if __name__ == "__main__":
    main()
