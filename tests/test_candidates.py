"""Tests for candidate string-pair generation (§III-C/D), oracle-checked
against SQL over the exploded posting list."""
import pandas as pd
import pytest

from repro.core.tokenize import tokenize
from repro.namegen import names_corpus_pdf
from repro.oracle import assert_equivalent
from repro.tsj.candidates import (
    generate_candidates,
    shared_token_pairs,
    similar_token_pairs,
)
from repro.tsj.massjoin import nld_token_selfjoin
from repro.tsj.tokens import build_strings, inverted_index, kept_tokens, token_space


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=250, seed=21)


@pytest.fixture(scope="module")
def index(spark, corpus_pdf):
    strings = build_strings(spark, spark.createDataFrame(corpus_pdf))
    kept = kept_tokens(token_space(strings), 10**9)
    idx = inverted_index(strings, kept)
    idx.cache().count()
    return idx


@pytest.fixture(scope="module")
def posting_pdf(corpus_pdf):
    rows = []
    for sid, name in zip(corpus_pdf["sid"], corpus_pdf["name"]):
        for tok in set(tokenize(name)):
            rows.append((sid, tok))
    return pd.DataFrame(rows, columns=["sid", "tok"])


class TestSharedTokenPairs:
    def test_against_oracle(self, spark, index, posting_pdf):
        got = shared_token_pairs(index)
        assert_equivalent(
            got,
            """
            SELECT a.sid AS sid1, b.sid AS sid2
            FROM posting a JOIN posting b
              ON a.tok = b.tok AND a.sid < b.sid
            """,
            posting=posting_pdf,
        )

    def test_canonical_order(self, spark, index):
        pdf = shared_token_pairs(index).toPandas()
        assert (pdf["sid1"] < pdf["sid2"]).all()

    def test_duplicates_one_per_shared_token(self, spark):
        names = pd.DataFrame({"sid": [0, 1], "name": ["ana bo", "ana bo cu"]})
        strings = build_strings(spark, spark.createDataFrame(names))
        idx = inverted_index(strings, kept_tokens(token_space(strings), 100))
        pdf = shared_token_pairs(idx).toPandas()
        assert len(pdf) == 2  # "ana" and "bo" each witness the pair once


class TestSimilarTokenPairs:
    def test_simple_pair_via_edited_token(self, spark):
        names = pd.DataFrame(
            {"sid": [0, 1], "name": ["anastasia bo", "anastasya cu"]}
        )
        strings = build_strings(spark, spark.createDataFrame(names))
        kept = kept_tokens(token_space(strings), 100)
        idx = inverted_index(strings, kept)
        tp = nld_token_selfjoin(kept, 0.2)
        pdf = similar_token_pairs(idx, tp).toPandas()
        assert set(zip(pdf["sid1"], pdf["sid2"])) == {(0, 1)}

    def test_no_pair_without_similar_tokens(self, spark):
        names = pd.DataFrame({"sid": [0, 1], "name": ["aaaa bbbb", "cccc dddd"]})
        strings = build_strings(spark, spark.createDataFrame(names))
        kept = kept_tokens(token_space(strings), 100)
        idx = inverted_index(strings, kept)
        tp = nld_token_selfjoin(kept, 0.2)
        assert similar_token_pairs(idx, tp).count() == 0

    def test_canonical_and_no_self(self, spark, index):
        tp = nld_token_selfjoin(index.select("tok").distinct(), 0.225)
        pdf = similar_token_pairs(index, tp).toPandas()
        assert (pdf["sid1"] < pdf["sid2"]).all() or len(pdf) == 0


class TestGenerateCandidates:
    def test_exact_mode_is_shared_only(self, spark, index):
        got = generate_candidates(index, None).toPandas()
        shared = shared_token_pairs(index).toPandas()
        assert len(got) == len(shared)

    def test_fuzzy_superset_of_shared(self, spark, index):
        tp = nld_token_selfjoin(index.select("tok").distinct(), 0.225)
        fuzzy = generate_candidates(index, tp).toPandas()
        shared = shared_token_pairs(index).toPandas()
        fz = set(zip(fuzzy["sid1"], fuzzy["sid2"]))
        sh = set(zip(shared["sid1"], shared["sid2"]))
        assert sh <= fz
