"""Fig 3: TSJ runtime while varying the max token frequency M, for the
three algorithms, grouping-on-one-string.

Paper observations to reproduce in shape: greedy saves ~9% over fuzzy,
exact saves ~33%; savings are fairly stable across M. The paper swept
M in 100..1000 on 44.4M names (M=1000 dropped ~1% of tokens); our M
sweep is scaled so its top value also drops ~1% of the corpus tokens
(DESIGN.md §3).

Usage: spark-submit jobs/fig3_runtime_vs_M.py [--n 20000] [--t 0.1]
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
    return sweep_m(spark, corpus, t=t, ms=tuple(ms), repeats=2)


def main(argv=None):
    p = base_parser(__doc__, n_default=20_000)
    p.add_argument("--t", type=float, default=0.1)
    a = p.parse_args(argv)
    spark = get_spark("fig3")
    table = run(spark, n=a.n, seed=a.seed, t=a.t)
    emit("fig3_runtime_vs_M", table[["m", "variant", "runtime_s", "n_pairs"]])


if __name__ == "__main__":
    main()
