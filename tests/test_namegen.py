"""Tests for the synthetic corpus generator (the dataset substitute —
DESIGN.md §3 lists the properties it must reproduce)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.sld import nsld
from repro.core.tokenize import tokenize
from repro.namegen import (
    name_changes_pdf,
    names_corpus_pdf,
    perturb_name,
    token_vocabulary,
    tokenized_strings_pdf,
)


class TestVocabulary:
    def test_deterministic(self):
        assert token_vocabulary(seed=1) == token_vocabulary(seed=1)

    def test_sizes(self):
        f, l = token_vocabulary(seed=2, n_first=50, n_last=80)
        assert len(f) == 50 and len(l) == 80

    def test_all_distinct(self):
        f, l = token_vocabulary(seed=3)
        assert len(set(f) | set(l)) == len(f) + len(l)

    def test_tokens_are_clean(self):
        f, _ = token_vocabulary(seed=4, n_first=30, n_last=30)
        for t in f:
            assert t.isalpha() and t.islower()


class TestCorpus:
    @pytest.fixture(scope="class")
    def corpus(self):
        return names_corpus_pdf(n=1500, seed=7)

    def test_deterministic(self):
        a = names_corpus_pdf(n=200, seed=9)
        b = names_corpus_pdf(n=200, seed=9)
        pd.testing.assert_frame_equal(a, b)

    def test_size_and_schema(self, corpus):
        assert len(corpus) == 1500
        assert list(corpus.columns) == ["sid", "name", "ring"]
        assert corpus["sid"].is_unique

    def test_ring_fraction(self, corpus):
        frac = (corpus["ring"] >= 0).mean()
        assert 0.25 < frac < 0.45

    def test_rings_contain_similar_pairs(self, corpus):
        # At T = 0.225 at least some ring siblings must be NSLD-similar.
        hits = 0
        for _, grp in corpus[corpus["ring"] >= 0].groupby("ring"):
            names = list(grp["name"])
            if len(names) < 2:
                continue
            if nsld(tokenize(names[0]), tokenize(names[1])) <= 0.225:
                hits += 1
        assert hits > 10

    def test_token_popularity_skewed(self, corpus):
        from collections import Counter

        c = Counter(t for nm in corpus["name"] for t in set(tokenize(nm)))
        counts = sorted(c.values(), reverse=True)
        # Zipf vocabulary: the head token is much more popular than the median.
        assert counts[0] > 10 * np.median(counts)


class TestPerturb:
    def test_aggressive_edits_every_token(self):
        rng = np.random.default_rng(0)
        base = ["maronel", "keliton", "bas"]
        for _ in range(20):
            clone = perturb_name(rng, base, aggressive=True)
            assert not set(clone) & set(base)

    def test_default_keeps_some_token_usually(self):
        rng = np.random.default_rng(1)
        base = ["maronel", "keliton", "bas"]
        kept = sum(bool(set(perturb_name(rng, base)) & set(base)) for _ in range(50))
        assert kept > 30

    def test_never_empty(self):
        rng = np.random.default_rng(2)
        for _ in range(100):
            assert perturb_name(rng, ["ana", "bo"])


class TestTokenizedStrings:
    def test_metadata(self):
        pdf = tokenized_strings_pdf(names_corpus_pdf(n=100, seed=3))
        for _, r in pdf.iterrows():
            assert r["l"] == sum(map(len, r["tokens"]))
            assert r["nt"] == len(r["tokens"])


class TestNameChanges:
    @pytest.fixture(scope="class")
    def changes(self):
        return name_changes_pdf(n=2000, seed=11)

    def test_balanced_labels(self, changes):
        assert changes["is_fraud"].mean() == pytest.approx(0.5, abs=0.01)

    def test_deterministic(self):
        a = name_changes_pdf(n=100, seed=5)
        b = name_changes_pdf(n=100, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_fraud_changes_are_more_drastic(self, changes):
        d = changes.apply(
            lambda r: nsld(tokenize(r["old_name"]), tokenize(r["new_name"])), axis=1
        )
        legit = d[~changes["is_fraud"]].mean()
        fraud = d[changes["is_fraud"]].mean()
        assert fraud > legit + 0.2
