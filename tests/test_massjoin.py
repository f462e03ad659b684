"""Correctness of the MassJoin NLD token self-join (§III-D).

Ground truth is the DuckDB cross join using its built-in `levenshtein`
(the oracle catches both missed pairs and spurious pairs), plus a
brute-force python check on the exact NLD values."""
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.levenshtein import nld
from repro.oracle import assert_equivalent
from repro.tsj.massjoin import nld_token_selfjoin


def token_frame(spark, toks):
    return spark.createDataFrame(pd.DataFrame({"tok": sorted(set(toks))}))


def brute_pairs(toks, t):
    toks = sorted(set(toks))
    out = set()
    for i, a in enumerate(toks):
        for b in toks[i + 1 :]:
            if nld(a, b) <= t + 1e-12:
                out.add((a, b))
    return out


VOCAB = ["maron", "marron", "maro", "kelit", "kelut", "bo", "bob", "anastasia",
         "anastasya", "xy", "jonathan", "jonathann", "q"]


class TestNldTokenSelfJoin:
    @pytest.mark.parametrize("t", [0.05, 0.1, 0.225, 0.4])
    def test_matches_brute_force(self, spark, t):
        got = nld_token_selfjoin(token_frame(spark, VOCAB), t).toPandas()
        got_pairs = set(zip(got["tok1"], got["tok2"]))
        assert got_pairs == brute_pairs(VOCAB, t)

    @pytest.mark.parametrize("t", [0.1, 0.225])
    def test_against_duckdb_oracle(self, spark, t):
        toks = pd.DataFrame({"tok": sorted(set(VOCAB))})
        got = nld_token_selfjoin(token_frame(spark, VOCAB), t).select(
            "tok1", "tok2", "ld"
        )
        assert_equivalent(
            got,
            f"""
            SELECT a.tok AS tok1, b.tok AS tok2,
                   levenshtein(a.tok, b.tok) AS ld
            FROM toks a JOIN toks b ON a.tok < b.tok
            WHERE 2.0 * levenshtein(a.tok, b.tok)
                  / (length(a.tok) + length(b.tok) + levenshtein(a.tok, b.tok))
                  <= {t} + 1e-12
            """,
            toks=toks,
        )

    def test_distance_values_exact(self, spark):
        got = nld_token_selfjoin(token_frame(spark, VOCAB), 0.4).toPandas()
        for _, r in got.iterrows():
            assert r["nld"] == pytest.approx(nld(r["tok1"], r["tok2"]))

    def test_no_self_pairs(self, spark):
        got = nld_token_selfjoin(token_frame(spark, VOCAB), 0.4).toPandas()
        assert (got["tok1"] != got["tok2"]).all()

    def test_no_duplicate_pairs(self, spark):
        got = nld_token_selfjoin(token_frame(spark, VOCAB), 0.4).toPandas()
        assert not got.duplicated(subset=["tok1", "tok2"]).any()

    def test_empty_result_when_all_distant(self, spark):
        got = nld_token_selfjoin(
            token_frame(spark, ["aaaa", "zzzz", "qqqq"]), 0.1
        ).toPandas()
        assert len(got) == 0

    @given(
        st.lists(st.text(alphabet="ab", min_size=1, max_size=7), min_size=2, max_size=14),
        st.sampled_from([0.1, 0.225, 0.35]),
    )
    @settings(max_examples=12, deadline=None)
    def test_random_vocab_completeness(self, spark, toks, t):
        got = nld_token_selfjoin(token_frame(spark, toks), t).toPandas()
        assert set(zip(got["tok1"], got["tok2"])) == brute_pairs(toks, t)
