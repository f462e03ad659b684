"""Tests for token-space construction, with the DuckDB oracle checking
the relational stages (document frequency, M-filter, inverted index)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.namegen import names_corpus_pdf
from repro.oracle import assert_equivalent
from repro.tsj.tokens import build_strings, inverted_index, kept_tokens, token_space


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=300, seed=7)


@pytest.fixture(scope="module")
def strings(spark, corpus_pdf):
    df = build_strings(spark, spark.createDataFrame(corpus_pdf))
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def exploded_pdf(corpus_pdf):
    """(sid, tok) rows per distinct token occurrence, built in pandas —
    the oracle-side ground truth for everything token-shaped."""
    from repro.core.tokenize import tokenize

    rows = []
    for sid, name in zip(corpus_pdf["sid"], corpus_pdf["name"]):
        for tok in set(tokenize(name)):
            rows.append((sid, tok))
    return pd.DataFrame(rows, columns=["sid", "tok"])


class TestBuildStrings:
    def test_row_count_matches_nonempty(self, strings, corpus_pdf):
        from repro.core.tokenize import tokenize

        expect = sum(1 for n in corpus_pdf["name"] if tokenize(n))
        assert strings.count() == expect

    def test_metadata_consistent(self, strings):
        pdf = strings.toPandas()
        for _, r in pdf.head(50).iterrows():
            assert r["l"] == sum(len(t) for t in r["tokens"])
            assert r["nt"] == len(r["tokens"])
            assert sorted(r["tok_lens"]) == list(r["tok_lens"])
            assert sorted(len(t) for t in r["tokens"]) == list(r["tok_lens"])

    def test_tokens_are_canonical_sorted(self, strings):
        pdf = strings.toPandas()
        for toks in pdf["tokens"].head(50):
            assert sorted(toks) == list(toks)

    def test_empty_names_dropped(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"sid": [0, 1], "name": ["...", "ana bo"]}))
        out = build_strings(spark, df).toPandas()
        assert list(out["sid"]) == [1]


class TestTokenSpace:
    def test_df_against_oracle(self, spark, strings, exploded_pdf):
        got = token_space(strings).select("tok", "df")
        assert_equivalent(
            got,
            "SELECT tok, COUNT(*) AS df FROM posting GROUP BY tok",
            posting=exploded_pdf,
        )

    def test_duplicate_token_in_one_string_counts_once(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"sid": [0], "name": ["ana ana"]}))
        ts = token_space(build_strings(spark, df)).toPandas()
        assert ts.loc[ts["tok"] == "ana", "df"].iloc[0] == 1

    def test_kept_tokens_against_oracle(self, spark, strings, exploded_pdf):
        m = 5
        got = kept_tokens(token_space(strings), m).select("tok", "df")
        assert_equivalent(
            got,
            f"SELECT tok, COUNT(*) AS df FROM posting GROUP BY tok HAVING COUNT(*) <= {m}",
            posting=exploded_pdf,
        )

    def test_len_column(self, strings):
        pdf = token_space(strings).toPandas()
        assert (pdf["len"] == pdf["tok"].str.len()).all()


class TestInvertedIndex:
    def test_against_oracle(self, spark, strings, exploded_pdf):
        m = 5
        kept = kept_tokens(token_space(strings), m)
        got = inverted_index(strings, kept).select("tok", "sid")
        assert_equivalent(
            got,
            f"""
            SELECT p.tok AS tok, p.sid AS sid FROM posting p
            JOIN (SELECT tok FROM posting GROUP BY tok HAVING COUNT(*) <= {m}) k
            USING (tok)
            """,
            posting=exploded_pdf,
        )

    def test_m_filter_drops_popular(self, spark, strings):
        ts = token_space(strings)
        most = ts.orderBy(F.desc("df")).first()
        kept = kept_tokens(ts, most["df"] - 1)
        idx = inverted_index(strings, kept)
        assert idx.where(F.col("tok") == most["tok"]).count() == 0
