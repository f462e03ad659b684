"""Fig 1: TSJ runtime vs number of machines for the two candidate-pair
dedup strategies (grouping-on-one-string vs grouping-on-both-strings).

Paper observations to reproduce in shape: both strategies scale out with
a speedup of ~3.8 at 10x machines; grouping-on-one-string is
consistently 13-32% faster. Machine counts are simulated (DESIGN.md §3).

Usage: spark-submit jobs/fig1_dedup_scaling.py [--n 20000] [--t 0.1] [--m 100]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import fig1_table  # noqa: E402
from repro.namegen import names_corpus  # noqa: E402


def run(spark, *, n=20_000, seed=7, t=0.1, m=100, workers=(100, 200, 400, 600, 800, 1000)):
    corpus = names_corpus(spark, n=n, seed=seed)
    corpus.cache().count()
    return fig1_table(spark, corpus, t=t, m=m, workers=tuple(workers))


def main(argv=None):
    p = base_parser(__doc__, n_default=20_000)
    p.add_argument("--t", type=float, default=0.1)
    p.add_argument("--m", type=int, default=100)
    a = p.parse_args(argv)
    spark = get_spark("fig1")
    emit("fig1_dedup_scaling", run(spark, n=a.n, seed=a.seed, t=a.t, m=a.m))


if __name__ == "__main__":
    main()
