"""End-to-end TSJ correctness against the brute-force reference.

The load-bearing guarantees (paper §V-B.2):
- fuzzy-token-matching with M = infinity is *complete and exact*;
- every variant has precision exactly 1.0 (all reported pairs truly
  have NSLD <= T, with the correct distance values);
- greedy / exact results are subsets of fuzzy (recall <= 1);
- both dedup strategies return identical result sets.
"""
import pandas as pd
import pytest

from repro.namegen import names_corpus_pdf
from repro.tsj.joiner import tsj_join
from repro.tsj.naive import naive_nsld_selfjoin

BIG_M = 10**9


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=220, seed=5)


@pytest.fixture(scope="module")
def corpus(spark, corpus_pdf):
    df = spark.createDataFrame(corpus_pdf)
    df.cache().count()
    return df


def as_pairset(pdf: pd.DataFrame):
    return set(zip(pdf["sid1"], pdf["sid2"]))


class TestFuzzyExactness:
    @pytest.mark.parametrize("t", [0.05, 0.1, 0.225])
    def test_matches_naive_join(self, spark, corpus, corpus_pdf, t):
        got = tsj_join(spark, corpus, t=t, m=BIG_M, variant="fuzzy").toPandas()
        exp = naive_nsld_selfjoin(corpus_pdf, t)
        assert as_pairset(got) == as_pairset(exp)
        got_d = dict(zip(zip(got["sid1"], got["sid2"]), got["sld"]))
        exp_d = dict(zip(zip(exp["sid1"], exp["sid2"]), exp["sld"]))
        assert got_d == exp_d

    def test_finds_ring_structure(self, spark, corpus, corpus_pdf):
        got = tsj_join(spark, corpus, t=0.225, m=BIG_M, variant="fuzzy").toPandas()
        ring = dict(zip(corpus_pdf["sid"], corpus_pdf["ring"]))
        same_ring = sum(
            1 for a, b in as_pairset(got) if ring[a] == ring[b] and ring[a] >= 0
        )
        assert same_ring > 0  # rings actually produce similar pairs


class TestPrecisionAlwaysOne:
    @pytest.mark.parametrize("variant", ["fuzzy", "greedy", "exact"])
    def test_all_reported_pairs_truly_similar(self, spark, corpus, corpus_pdf, variant):
        t = 0.2
        got = tsj_join(spark, corpus, t=t, m=BIG_M, variant=variant).toPandas()
        truth = as_pairset(naive_nsld_selfjoin(corpus_pdf, t))
        assert as_pairset(got) <= truth


class TestApproximations:
    def test_greedy_subset_of_fuzzy(self, spark, corpus):
        t = 0.225
        fz = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="fuzzy").toPandas())
        gr = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="greedy").toPandas())
        assert gr <= fz

    def test_exact_subset_of_fuzzy(self, spark, corpus):
        t = 0.225
        fz = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="fuzzy").toPandas())
        ex = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="exact").toPandas())
        assert ex <= fz

    def test_exact_misses_fully_edited_pairs(self, spark, corpus, corpus_pdf):
        # At a large T some similar pairs share no token; exact-token-
        # matching cannot see them (that is the Fig-4 recall story).
        t = 0.25
        fz = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="fuzzy").toPandas())
        ex = as_pairset(tsj_join(spark, corpus, t=t, m=BIG_M, variant="exact").toPandas())
        assert ex < fz


class TestDedupStrategies:
    @pytest.mark.parametrize("variant", ["fuzzy", "exact"])
    def test_one_equals_both(self, spark, corpus, variant):
        t = 0.15
        one = tsj_join(spark, corpus, t=t, m=BIG_M, variant=variant, dedup="one").toPandas()
        both = tsj_join(spark, corpus, t=t, m=BIG_M, variant=variant, dedup="both").toPandas()
        assert as_pairset(one) == as_pairset(both)


class TestMFilter:
    def test_small_m_loses_pairs_monotonically(self, spark, corpus):
        t = 0.1
        sizes = []
        for m in (1, 20, BIG_M):
            got = tsj_join(spark, corpus, t=t, m=m, variant="fuzzy").toPandas()
            sizes.append(len(got))
        assert sizes[0] <= sizes[1] <= sizes[2]
        assert sizes[0] < sizes[2]  # popular tokens do carry pairs

    def test_m_filtered_results_still_precise(self, spark, corpus, corpus_pdf):
        t = 0.1
        got = tsj_join(spark, corpus, t=t, m=20, variant="fuzzy").toPandas()
        truth = as_pairset(naive_nsld_selfjoin(corpus_pdf, t))
        assert as_pairset(got) <= truth


class TestValidation:
    def test_bad_variant(self, spark, corpus):
        with pytest.raises(ValueError):
            tsj_join(spark, corpus, variant="bogus")

    def test_bad_dedup(self, spark, corpus):
        with pytest.raises(ValueError):
            tsj_join(spark, corpus, dedup="neither")

    def test_artifacts_returned(self, spark, corpus):
        art = tsj_join(
            spark, corpus, t=0.1, m=BIG_M, variant="exact", return_artifacts=True
        )
        assert art.token_pairs is None
        assert art.result.columns == ["sid1", "sid2", "sld", "nsld"]
        assert art.candidates_filtered.columns == ["sid1", "sid2"]
