"""Tests for the whitespace+punctuation tokenizer (paper §V)."""
from repro.core.tokenize import tokenize


class TestTokenize:
    def test_whitespace_split(self):
        assert tokenize("barak obama") == ["barak", "obama"]

    def test_punctuation_split(self):
        # Paper example: "Obamma, Boraak H." tokenizes on punctuation too.
        assert tokenize("Obamma, Boraak H.") == ["boraak", "h", "obamma"]

    def test_lowercased(self):
        assert tokenize("Burak Ubama") == ["burak", "ubama"]

    def test_canonical_sorted_multiset(self):
        assert tokenize("b a") == tokenize("a b")

    def test_duplicates_kept(self):
        assert tokenize("ana ana") == ["ana", "ana"]

    def test_empty_string(self):
        assert tokenize("") == []

    def test_only_punctuation(self):
        assert tokenize(" .,-- ") == []

    def test_digits_kept(self):
        assert tokenize("john 2nd") == ["2nd", "john"]

    def test_collapsed_separators(self):
        assert tokenize("a,,   b..c") == ["a", "b", "c"]
