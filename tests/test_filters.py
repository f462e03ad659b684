"""Tests for the candidate filters (§III-E): oracle checks for the
relational length filter and admissibility of both filters against the
brute-force join (a filter may never drop a truly similar pair)."""
import pandas as pd
import pytest

from repro.namegen import names_corpus_pdf
from repro.oracle import assert_equivalent
from repro.tsj.filters import attach_meta, histogram_filter, length_filter
from repro.tsj.naive import naive_nsld_selfjoin
from repro.tsj.tokens import build_strings

T = 0.15


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=200, seed=33)


@pytest.fixture(scope="module")
def strings(spark, corpus_pdf):
    df = build_strings(spark, spark.createDataFrame(corpus_pdf))
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def all_pairs(spark, strings):
    """Every canonical sid pair — worst-case candidate stream."""
    a = strings.selectExpr("sid as sid1")
    b = strings.selectExpr("sid as sid2")
    df = a.crossJoin(b).where("sid1 < sid2")
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def truth(corpus_pdf):
    return naive_nsld_selfjoin(corpus_pdf, T)


@pytest.fixture(scope="module")
def meta_pdf(strings):
    pdf = strings.select("sid", "l").toPandas()
    pdf["l"] = pdf["l"].astype("int64")
    return pdf


class TestLengthFilter:
    def test_against_oracle(self, spark, strings, all_pairs, meta_pdf):
        got = length_filter(attach_meta(all_pairs, strings), T).select("sid1", "sid2")
        assert_equivalent(
            got,
            f"""
            SELECT a.sid AS sid1, b.sid AS sid2
            FROM meta a JOIN meta b ON a.sid < b.sid
            WHERE least(a.l, b.l) >= (1 - {T}) * greatest(a.l, b.l)
            """,
            meta=meta_pdf,
        )

    def test_admissible(self, spark, strings, all_pairs, truth):
        kept = length_filter(attach_meta(all_pairs, strings), T)
        kept_pairs = set(map(tuple, kept.select("sid1", "sid2").toPandas().values))
        for s1, s2 in zip(truth["sid1"], truth["sid2"]):
            assert (s1, s2) in kept_pairs

    def test_prunes_something(self, spark, strings, all_pairs):
        kept = length_filter(attach_meta(all_pairs, strings), T)
        assert kept.count() < all_pairs.count()


class TestHistogramFilter:
    def test_admissible(self, spark, strings, all_pairs, truth):
        kept = histogram_filter(attach_meta(all_pairs, strings), T)
        kept_pairs = set(map(tuple, kept.select("sid1", "sid2").toPandas().values))
        for s1, s2 in zip(truth["sid1"], truth["sid2"]):
            assert (s1, s2) in kept_pairs

    def test_prunes_more_than_length_alone(self, spark, strings, all_pairs):
        lf = length_filter(attach_meta(all_pairs, strings), T)
        hf = histogram_filter(lf, T)
        assert hf.count() <= lf.count()

    def test_empty_input(self, spark, strings, all_pairs):
        empty = attach_meta(all_pairs.where("sid1 < 0"), strings)
        assert histogram_filter(empty, T).count() == 0
