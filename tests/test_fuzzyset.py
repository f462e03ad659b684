"""Tests for the weighted fuzzy set measures [67] and the ROC tooling."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.fuzzyset.measures import (
    fcosine,
    fdice,
    fjaccard,
    fuzzy_overlap,
    idf_weights,
    weighted_size,
)
from repro.fuzzyset.roc import auc, roc_curve

W = {"ana": 1.0, "bo": 2.0, "anna": 1.0, "cu": 3.0, "zzzz": 5.0}
TOKS = st.lists(st.sampled_from(list(W)), max_size=4)


class TestIdfWeights:
    def test_rare_tokens_weigh_more(self):
        w = idf_weights({"rare": 1, "common": 1000}, 1000)
        assert w["rare"] > w["common"]

    def test_zero_df_dropped(self):
        assert "x" not in idf_weights({"x": 0, "y": 3}, 10)


class TestFuzzyOverlap:
    def test_exact_match_full_weight(self):
        assert fuzzy_overlap(["ana", "bo"], ["ana", "bo"], W) == pytest.approx(3.0)

    def test_disjoint_dissimilar_zero(self):
        assert fuzzy_overlap(["ana"], ["zzzz"], W) == 0.0

    def test_fuzzy_match_discounted(self):
        # ana ~ anna: NLD = 2/(3+4+1) = 0.25, sim = 0.75 < 0.8 -> no match
        assert fuzzy_overlap(["ana"], ["anna"], W, delta=0.8) == 0.0
        # with delta = 0.7 it matches, contributing 0.75 * avg weight
        assert fuzzy_overlap(["ana"], ["anna"], W, delta=0.7) == pytest.approx(0.75)

    def test_one_to_one_matching(self):
        # Two copies of "ana" on one side match at most two on the other.
        o = fuzzy_overlap(["ana", "ana", "ana"], ["ana"], W)
        assert o == pytest.approx(1.0)

    @given(TOKS, TOKS)
    @settings(max_examples=150)
    def test_symmetry(self, a, b):
        assert fuzzy_overlap(a, b, W) == pytest.approx(fuzzy_overlap(b, a, W))

    @given(TOKS, TOKS)
    @settings(max_examples=150)
    def test_bounded_by_sizes(self, a, b):
        o = fuzzy_overlap(a, b, W)
        assert o <= min(weighted_size(a, W), weighted_size(b, W)) + 1e-9


class TestMeasures:
    @pytest.mark.parametrize("f", [fjaccard, fcosine, fdice])
    def test_identity_is_one(self, f):
        assert f(["ana", "bo"], ["ana", "bo"], W) == pytest.approx(1.0)

    @pytest.mark.parametrize("f", [fjaccard, fcosine, fdice])
    def test_disjoint_is_zero(self, f):
        assert f(["ana"], ["zzzz"], W) == 0.0

    @pytest.mark.parametrize("f", [fjaccard, fcosine, fdice])
    @given(a=TOKS, b=TOKS)
    @settings(max_examples=100)
    def test_range(self, f, a, b):
        assert 0.0 <= f(a, b, W) <= 1.0 + 1e-9

    def test_jaccard_leq_dice(self):
        a, b = ["ana", "bo"], ["ana", "cu"]
        assert fjaccard(a, b, W) <= fdice(a, b, W)


class TestROC:
    def test_perfect_separation(self):
        fpr, tpr = roc_curve(np.array([0.9, 0.8, 0.1, 0.2]),
                             np.array([True, True, False, False]))
        assert auc(fpr, tpr) == pytest.approx(1.0)

    def test_random_scores_half(self):
        rng = np.random.default_rng(0)
        s = rng.random(4000)
        y = rng.random(4000) < 0.5
        assert auc(*roc_curve(s, y)) == pytest.approx(0.5, abs=0.03)

    def test_inverted_scores_zero(self):
        fpr, tpr = roc_curve(np.array([0.1, 0.2, 0.8, 0.9]),
                             np.array([True, True, False, False]))
        assert auc(fpr, tpr) == pytest.approx(0.0)

    def test_curve_monotone(self):
        rng = np.random.default_rng(1)
        s = rng.random(500)
        y = rng.random(500) < 0.4
        fpr, tpr = roc_curve(s, y)
        assert (np.diff(fpr) >= 0).all()
        assert (np.diff(tpr) >= 0).all()

    def test_ties_handled(self):
        fpr, tpr = roc_curve(np.array([0.5, 0.5, 0.5]), np.array([True, False, True]))
        assert fpr[-1] == 1.0 and tpr[-1] == 1.0
