"""Unit tests for LD / banded LD / NLD (paper §II-C)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.levenshtein import ld, ld_banded, nld, nld_from_ld, within_nld

WORDS = st.text(alphabet="abcde", max_size=12)


class TestLD:
    @pytest.mark.parametrize(
        "x,y,expect",
        [
            ("", "", 0),
            ("a", "", 1),
            ("", "abc", 3),
            ("abc", "abc", 0),
            ("kitten", "sitting", 3),
            ("flaw", "lawn", 2),
            ("thomson", "thompson", 1),  # paper example
            ("alex", "alexa", 1),  # paper example
            ("chan", "chank", 1),  # paper example
            ("kalan", "alan", 1),  # paper example
            ("abc", "cba", 2),
        ],
    )
    def test_known_values(self, x, y, expect):
        assert ld(x, y) == expect

    @given(WORDS, WORDS)
    def test_symmetry(self, x, y):
        assert ld(x, y) == ld(y, x)

    @given(WORDS)
    def test_identity(self, x):
        assert ld(x, x) == 0

    @given(WORDS, WORDS, WORDS)
    @settings(max_examples=150)
    def test_triangle(self, x, y, z):
        assert ld(x, y) + ld(y, z) >= ld(x, z)

    @given(WORDS, WORDS)
    def test_length_difference_lower_bound(self, x, y):
        assert ld(x, y) >= abs(len(x) - len(y))

    @given(WORDS, WORDS)
    def test_max_length_upper_bound(self, x, y):
        assert ld(x, y) <= max(len(x), len(y))


class TestBandedLD:
    @given(WORDS, WORDS, st.integers(min_value=0, max_value=12))
    @settings(max_examples=300)
    def test_matches_exact_within_band(self, x, y, k):
        d = ld(x, y)
        banded = ld_banded(x, y, k)
        if d <= k:
            assert banded == d
        else:
            assert banded is None

    def test_negative_budget(self):
        assert ld_banded("a", "a", -1) is None

    def test_zero_budget_equal(self):
        assert ld_banded("abc", "abc", 0) == 0

    def test_zero_budget_unequal(self):
        assert ld_banded("abc", "abd", 0) is None


class TestNLD:
    def test_paper_examples(self):
        assert nld("thomson", "thompson") == pytest.approx(1 / 8)
        assert nld("alex", "alexa") == pytest.approx(1 / 5)

    def test_empty_vs_empty(self):
        assert nld("", "") == 0.0

    def test_empty_vs_nonempty_is_one(self):
        assert nld("", "abc") == 1.0

    @given(WORDS, WORDS)
    def test_range(self, x, y):
        assert 0.0 <= nld(x, y) <= 1.0

    @given(WORDS, WORDS)
    def test_symmetry(self, x, y):
        assert nld(x, y) == pytest.approx(nld(y, x))

    @given(WORDS, WORDS, WORDS)
    @settings(max_examples=150)
    def test_triangle(self, x, y, z):
        # Theorem 1 ([37]): NLD is a metric.
        assert nld(x, y) + nld(y, z) >= nld(x, z) - 1e-12

    @given(WORDS, WORDS)
    def test_lemma3_sandwich(self, x, y):
        # Lemma 3: 1 - |x|/|y| <= NLD <= 2 / (|x|/|y| + 2) for |y| >= |x|.
        if len(y) < len(x):
            x, y = y, x
        if len(y) == 0:
            return
        v = nld(x, y)
        assert v >= 1 - len(x) / len(y) - 1e-12
        assert v <= 2 / (len(x) / len(y) + 2) + 1e-12

    @given(WORDS, WORDS)
    def test_nld_from_ld_consistent(self, x, y):
        assert nld_from_ld(ld(x, y), len(x), len(y)) == pytest.approx(nld(x, y))


class TestWithinNLD:
    @given(WORDS, WORDS, st.sampled_from([0.025, 0.1, 0.225, 0.5, 0.9]))
    @settings(max_examples=300)
    def test_predicate_matches_exact(self, x, y, t):
        d = within_nld(x, y, t)
        if nld(x, y) <= t + 1e-12:
            assert d == ld(x, y)
        else:
            assert d is None

    def test_t_geq_one(self):
        assert within_nld("abc", "zzzzzz", 1.0) == 6
