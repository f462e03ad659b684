"""Property tests for the PassJoin segment/substring machinery.

The load-bearing property is *completeness*: for every pair with
LD <= tau, some even segment of the longer string appears among the
multi-match-aware substrings of the shorter one (Lemma 7 + PassJoin's
window selection)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.levenshtein import ld
from repro.tsj.passjoin import (
    even_partition,
    probe_substrings,
    segments_of,
    substring_window,
)

WORDS = st.text(alphabet="ab", min_size=1, max_size=12)


class TestEvenPartition:
    @given(st.integers(min_value=0, max_value=50), st.integers(min_value=1, max_value=8))
    def test_covers_exactly(self, length, n):
        segs = even_partition(length, n)
        assert len(segs) == n
        pos = 0
        for start, seg_len in segs:
            assert start == pos
            pos += seg_len
        assert pos == length

    @given(st.integers(min_value=1, max_value=50), st.integers(min_value=1, max_value=8))
    def test_lengths_differ_by_at_most_one(self, length, n):
        lens = [sl for _, sl in even_partition(length, n)]
        assert max(lens) - min(lens) <= 1

    def test_rejects_zero_segments(self):
        with pytest.raises(ValueError):
            even_partition(5, 0)

    def test_known_split(self):
        assert even_partition(7, 3) == [(0, 2), (2, 2), (4, 3)]


class TestSegmentsOf:
    def test_concatenation_recovers_string(self):
        y = "abcdefgh"
        segs = segments_of(y, 2)
        assert "".join(chunk for _, _, chunk in segs) == y

    def test_segment_count_is_tau_plus_one(self):
        assert len(segments_of("abcdefgh", 3)) == 4


class TestWindow:
    def test_window_within_probe(self):
        lo, hi = substring_window(5, 6, 1, 0, 0, 3)
        assert lo >= 0
        assert hi <= 5 - 3

    @given(WORDS, WORDS, st.integers(min_value=0, max_value=3))
    @settings(max_examples=500)
    def test_completeness(self, x, y, tau):
        # If LD(x, y) <= tau (and |x| <= |y|), some segment of y is among
        # the probe substrings of x with the same segment index.
        if len(x) > len(y):
            x, y = y, x
        if ld(x, y) > tau or tau >= len(y):
            return
        segs = {(i, chunk) for i, _, chunk in segments_of(y, tau)}
        subs = set(probe_substrings(x, len(y), tau))
        assert segs & subs, f"no shared chunk for {x!r} ~ {y!r} tau={tau}"
