"""Property tests proving each pruning bound is admissible — no bound
may ever exclude a truly similar pair (Lemmas 6, 8, 9, 10 + histogram)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bounds import (
    ld_lower_bound_unmatched,
    ld_upper_bound,
    length_filter_ok,
    max_index_length,
    min_probe_length,
    nsld_lower_bound,
    segment_count,
    sld_lower_bound,
)
from repro.core.levenshtein import ld, nld
from repro.core.sld import agg_length, nsld, sld

WORDS = st.text(alphabet="abcd", max_size=10)
TOKEN = st.text(alphabet="abcd", min_size=1, max_size=6)
TOKSTR = st.lists(TOKEN, max_size=4)
THRESH = st.sampled_from([0.025, 0.05, 0.1, 0.15, 0.225, 0.4])


class TestLemma8:
    @given(WORDS, WORDS, THRESH)
    @settings(max_examples=300)
    def test_upper_bound_holds(self, x, y, t):
        if nld(x, y) <= t:
            assert ld(x, y) <= ld_upper_bound(len(x), len(y), t)

    def test_known_value(self):
        # t=0.1, ly=10, lx<=ly: floor(2*0.1*10/1.9) = 1
        assert ld_upper_bound(8, 10, 0.1) == 1


class TestLemma9:
    @given(WORDS, WORDS, THRESH)
    @settings(max_examples=300)
    def test_min_length_holds(self, x, y, t):
        if len(x) > len(y):
            x, y = y, x
        if nld(x, y) <= t:
            assert min_probe_length(len(y), t) <= len(x)

    @given(st.integers(min_value=0, max_value=60), THRESH)
    def test_max_index_length_inverts(self, lx, t):
        ly = max_index_length(lx, t)
        assert min_probe_length(ly, t) <= lx
        assert min_probe_length(ly + 1, t) > lx


class TestLemma10:
    @given(WORDS, WORDS, THRESH)
    @settings(max_examples=300)
    def test_exclusive_lower_bound(self, x, y, t):
        if nld(x, y) > t:
            assert ld(x, y) > ld_lower_bound_unmatched(len(x), len(y), t)


class TestSegmentCount:
    @given(st.integers(min_value=1, max_value=40), THRESH)
    def test_at_least_one_segment(self, ly, t):
        assert segment_count(ly, t) >= 1

    def test_grows_with_length(self):
        assert segment_count(40, 0.1) >= segment_count(4, 0.1)


class TestLengthFilter:
    @given(TOKSTR, TOKSTR, THRESH)
    @settings(max_examples=300, deadline=None)
    def test_admissible(self, xt, yt, t):
        # Lemma 6: a similar pair always passes the length filter.
        if nsld(xt, yt) <= t:
            assert length_filter_ok(agg_length(xt), agg_length(yt), t)

    def test_prunes_gross_mismatch(self):
        assert not length_filter_ok(2, 100, 0.1)

    def test_symmetric(self):
        assert length_filter_ok(9, 10, 0.1) == length_filter_ok(10, 9, 0.1)


class TestHistogramBound:
    @given(TOKSTR, TOKSTR)
    @settings(max_examples=300, deadline=None)
    def test_sld_lower_bound_admissible(self, xt, yt):
        hx = [len(a) for a in xt]
        hy = [len(b) for b in yt]
        assert sld_lower_bound(hx, hy) <= sld(xt, yt)

    @given(TOKSTR, TOKSTR)
    @settings(max_examples=300, deadline=None)
    def test_nsld_lower_bound_admissible(self, xt, yt):
        hx = [len(a) for a in xt]
        hy = [len(b) for b in yt]
        assert nsld_lower_bound(hx, hy) <= nsld(xt, yt) + 1e-12

    def test_exact_when_only_lengths_differ(self):
        # x = {"aaa"}, y = {"a"}: bound = 2 = true SLD.
        assert sld_lower_bound([3], [1]) == 2
        assert sld(["aaa"], ["a"]) == 2

    def test_zero_for_identical_histograms(self):
        assert sld_lower_bound([3, 4], [4, 3]) == 0

    def test_unbalanced_token_counts(self):
        # Extra token must be deleted entirely: bound counts its length.
        assert sld_lower_bound([3, 4], [4]) == 3

    def test_empty_histograms(self):
        assert sld_lower_bound([], []) == 0
        assert nsld_lower_bound([], []) == 0.0
