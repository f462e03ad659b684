"""Fig 4: number of discovered similar pairs (and recall relative to
fuzzy-token-matching) while varying T.

Paper observations to reproduce in shape: precision is always 1.0;
greedy recall decays from 1.0 only marginally (to 0.99993 at T=0.225);
exact recall decays much faster (to 0.86655 at T=0.225).

Usage: spark-submit jobs/fig4_pairs_vs_T.py [--n 20000] [--m 100]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import PAPER_T_SWEEP, sweep_t  # noqa: E402
from repro.namegen import names_corpus  # noqa: E402


def run(spark, *, n=20_000, seed=7, m=100, ts=PAPER_T_SWEEP):
    corpus = names_corpus(spark, n=n, seed=seed)
    corpus.cache().count()
    return sweep_t(spark, corpus, m=m, ts=tuple(ts))


def main(argv=None):
    p = base_parser(__doc__, n_default=20_000)
    p.add_argument("--m", type=int, default=100)
    a = p.parse_args(argv)
    spark = get_spark("fig4")
    table = run(spark, n=a.n, seed=a.seed, m=a.m)
    emit("fig4_pairs_vs_T", table[["t", "variant", "n_pairs", "recall"]])


if __name__ == "__main__":
    main()
