"""HMJ baseline correctness: the metric-space join must find exactly the
same pair set as the brute-force NSLD join (its filters are exact, only
its *performance* is poor — that is the Fig-7 story)."""
import pandas as pd
import pytest

from repro.hmj.joiner import hmj_join, sample_centroids
from repro.namegen import names_corpus_pdf
from repro.tsj.naive import naive_nsld_selfjoin
from repro.tsj.tokens import build_strings


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=150, seed=77)


@pytest.fixture(scope="module")
def corpus(spark, corpus_pdf):
    df = spark.createDataFrame(corpus_pdf)
    df.cache().count()
    return df


def as_pairset(pdf):
    return set(zip(pdf["sid1"], pdf["sid2"]))


class TestHMJ:
    @pytest.mark.parametrize("t", [0.1, 0.225])
    def test_matches_naive(self, spark, corpus, corpus_pdf, t):
        got = hmj_join(spark, corpus, t=t, n_centroids=6, seed=3).toPandas()
        exp = naive_nsld_selfjoin(corpus_pdf, t)
        assert as_pairset(got) == as_pairset(exp)

    def test_distances_correct(self, spark, corpus, corpus_pdf):
        got = hmj_join(spark, corpus, t=0.225, n_centroids=6, seed=3).toPandas()
        exp = naive_nsld_selfjoin(corpus_pdf, 0.225)
        e = dict(zip(zip(exp["sid1"], exp["sid2"]), exp["nsld"]))
        for _, r in got.iterrows():
            assert r["nsld"] == pytest.approx(e[(r["sid1"], r["sid2"])])

    def test_recursive_split_still_complete(self, spark, corpus, corpus_pdf):
        # Force sub-partitioning with a tiny max_partition.
        got = hmj_join(
            spark, corpus, t=0.1, n_centroids=4, max_partition=20, seed=9
        ).toPandas()
        exp = naive_nsld_selfjoin(corpus_pdf, 0.1)
        assert as_pairset(got) == as_pairset(exp)

    def test_no_duplicate_pairs(self, spark, corpus):
        got = hmj_join(spark, corpus, t=0.225, n_centroids=6, seed=3).toPandas()
        assert not got.duplicated(subset=["sid1", "sid2"]).any()

    def test_replication_is_heavy(self, spark, corpus):
        # The [0,1]-bounded metric space makes most strings replicate to
        # most partitions — the pathology behind Fig 7.
        _, replicas = hmj_join(
            spark, corpus, t=0.1, n_centroids=6, seed=3, return_replicas=True
        )
        n_strings = build_strings(spark, corpus).count()
        factor = replicas.count() / n_strings
        assert factor > 2.0

    def test_centroid_sampling_deterministic(self, spark, corpus):
        s = build_strings(spark, corpus)
        assert sample_centroids(s, 5, 1) == sample_centroids(s, 5, 1)
