"""Fig 5: number of discovered similar pairs (and recall relative to
fuzzy-token-matching) while varying M.

Paper observations to reproduce in shape: greedy recall is stable
~0.999999 across M; exact recall sits between 0.974 and 0.985; pair
counts grow with M, but less aggressively than with T.

Usage: spark-submit jobs/fig5_pairs_vs_M.py [--n 20000] [--t 0.1]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import sweep_m  # noqa: E402
from repro.namegen import names_corpus  # noqa: E402

DEFAULT_MS = (10, 25, 50, 75, 100)


def run(spark, *, n=20_000, seed=7, t=0.1, ms=DEFAULT_MS):
    corpus = names_corpus(spark, n=n, seed=seed)
    corpus.cache().count()
    return sweep_m(spark, corpus, t=t, ms=tuple(ms))


def main(argv=None):
    p = base_parser(__doc__, n_default=20_000)
    p.add_argument("--t", type=float, default=0.1)
    a = p.parse_args(argv)
    spark = get_spark("fig5")
    table = run(spark, n=a.n, seed=a.seed, t=a.t)
    emit("fig5_pairs_vs_M", table[["m", "variant", "n_pairs", "recall"]])


if __name__ == "__main__":
    main()
