"""Fig 7: TSJ vs the Hybrid Metric Joiner (HMJ) while varying machines.

Paper observations to reproduce in shape: TSJ is 12-15x faster than HMJ
on every machine count where HMJ finishes; HMJ does not finish in
reasonable time at 100 machines (its Voronoi partitions stay dense
because NSLD packs token-disjoint names at distance ~1 from every
centroid, so scale-out barely helps). Machine counts are simulated;
both single-host wall-clocks are also reported.

The corpus is smaller than in Figs 1-5 because HMJ's replication makes
it quadratic in practice — which is the point of the figure.

Usage: spark-submit jobs/fig7_tsj_vs_hmj.py [--n 1200] [--t 0.1] [--m 100]
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, emit, get_spark  # noqa: E402

from repro.experiments import fig7_table  # noqa: E402
from repro.namegen import names_corpus  # noqa: E402


def run(spark, *, n=1200, seed=7, t=0.1, m=10**9, n_centroids=16):
    corpus = names_corpus(spark, n=n, seed=seed)
    corpus.cache().count()
    return fig7_table(spark, corpus, t=t, m=m, n_centroids=n_centroids)


def main(argv=None):
    p = base_parser(__doc__, n_default=1200)
    p.add_argument("--t", type=float, default=0.1)
    p.add_argument("--m", type=int, default=10**9,
                   help="default: no M filtering, so TSJ and HMJ return identical pair sets")
    p.add_argument("--centroids", type=int, default=16)
    a = p.parse_args(argv)
    spark = get_spark("fig7")
    emit("fig7_tsj_vs_hmj",
         run(spark, n=a.n, seed=a.seed, t=a.t, m=a.m, n_centroids=a.centroids))


if __name__ == "__main__":
    main()
