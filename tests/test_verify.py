"""Tests for the verification stage (§III-F) in both physical shapes."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.sld import nsld
from repro.core.tokenize import tokenize
from repro.namegen import names_corpus_pdf
from repro.tsj.dedup import with_group_key
from repro.tsj.tokens import build_strings
from repro.tsj.verify import attach_tokens, verify_grouped, verify_pairs

T = 0.25


@pytest.fixture(scope="module")
def corpus_pdf():
    return names_corpus_pdf(n=120, seed=44)


@pytest.fixture(scope="module")
def strings(spark, corpus_pdf):
    df = build_strings(spark, spark.createDataFrame(corpus_pdf))
    df.cache().count()
    return df


@pytest.fixture(scope="module")
def pairs(spark, strings):
    a = strings.selectExpr("sid as sid1")
    b = strings.selectExpr("sid as sid2")
    df = a.crossJoin(b).where("sid1 < sid2")
    df.cache().count()
    return df


def expected_pairs(corpus_pdf, align="hungarian"):
    from repro.core.sld import sld, sld_greedy

    f = sld if align == "hungarian" else sld_greedy
    toks = {
        sid: tokenize(nm)
        for sid, nm in zip(corpus_pdf["sid"], corpus_pdf["name"])
        if tokenize(nm)
    }
    out = {}
    sids = sorted(toks)
    for i, a in enumerate(sids):
        for b in sids[i + 1 :]:
            s = f(toks[a], toks[b])
            la = sum(map(len, toks[a]))
            lb = sum(map(len, toks[b]))
            v = 2.0 * s / (la + lb + s) if (la + lb + s) else 0.0
            if v <= T + 1e-12:
                out[(a, b)] = s
    return out


class TestVerifyPairs:
    @pytest.mark.parametrize("align", ["hungarian", "greedy"])
    def test_matches_reference(self, spark, strings, pairs, corpus_pdf, align):
        got = verify_pairs(attach_tokens(pairs, strings), T, align).toPandas()
        exp = expected_pairs(corpus_pdf, align)
        assert dict(zip(zip(got["sid1"], got["sid2"]), got["sld"])) == exp

    def test_nsld_values_correct(self, spark, strings, pairs, corpus_pdf):
        got = verify_pairs(attach_tokens(pairs, strings), T, "hungarian").toPandas()
        toks = {s: tokenize(n) for s, n in zip(corpus_pdf["sid"], corpus_pdf["name"])}
        for _, r in got.head(40).iterrows():
            assert r["nsld"] == pytest.approx(nsld(toks[r["sid1"]], toks[r["sid2"]]))

    def test_unknown_align_rejected(self, spark, strings, pairs):
        with pytest.raises(ValueError):
            verify_pairs(attach_tokens(pairs, strings), T, "nope")


class TestVerifyGrouped:
    def _keyed(self, strings, cand):
        keyed = with_group_key(cand)
        k = strings.select(
            F.col("sid").alias("ksid"),
            F.col("tokens").alias("ktokens"),
            F.col("l").alias("kl"),
        )
        v = strings.select(
            F.col("sid").alias("vsid"),
            F.col("tokens").alias("vtokens"),
            F.col("l").alias("vl"),
        )
        return keyed.join(k, "ksid").join(v, "vsid")

    @pytest.mark.parametrize("align", ["hungarian", "greedy"])
    def test_matches_pairwise_shape(self, spark, strings, pairs, corpus_pdf, align):
        got = verify_grouped(self._keyed(strings, pairs), T, align).toPandas()
        exp = expected_pairs(corpus_pdf, align)
        assert dict(zip(zip(got["sid1"], got["sid2"]), got["sld"])) == exp

    def test_duplicates_deduped_inside_group(self, spark, strings):
        # The same pair fed 3x must be verified and emitted exactly once.
        dup = spark.createDataFrame(
            pd.DataFrame({"sid1": [0, 0, 0], "sid2": [1, 1, 1]})
        )
        got = verify_grouped(self._keyed(strings, dup), 1.0, "hungarian").toPandas()
        assert len(got) == 1
