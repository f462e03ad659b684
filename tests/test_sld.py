"""Unit + property tests for SLD / NSLD (paper §II-D) and the greedy
approximation (§III-G.5)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.sld import (
    agg_length,
    cost_bigraph,
    nsld,
    nsld_from_sld,
    nsld_greedy,
    sld,
    sld_greedy,
)

TOKEN = st.text(alphabet="abcde", min_size=1, max_size=6)
TOKSTR = st.lists(TOKEN, max_size=4)


class TestAggLength:
    def test_empty(self):
        assert agg_length([]) == 0

    def test_paper_example(self):
        assert agg_length(["chan", "kalan"]) == 9


class TestCostBigraph:
    def test_padding_to_max(self):
        m = cost_bigraph(["ab"], ["cd", "ef", "gh"])
        assert len(m) == 3 and all(len(r) == 3 for r in m)

    def test_epsilon_cost_is_token_length(self):
        m = cost_bigraph(["abc"], ["x", "y"])
        # row 1 is the padded ε token of x: cost vs "x"/"y" is 1.
        assert m[1] == [1, 1]


class TestSLD:
    def test_paper_example_two_edits(self):
        # SLD({chan, kalan}, {chank, alan}) = 2 (§II-D.1)
        assert sld(["chan", "kalan"], ["chank", "alan"]) == 2

    def test_paper_example_drop_token(self):
        # SLD({chan, kalan}, {alan}) = 5: kalan->alan (1) + delete chan (4).
        assert sld(["chan", "kalan"], ["alan"]) == 5

    def test_identity(self):
        assert sld(["a", "b"], ["a", "b"]) == 0

    def test_order_invariance(self):
        assert sld(["b", "a"], ["a", "b"]) == 0

    def test_empty_vs_empty(self):
        assert sld([], []) == 0

    def test_empty_vs_tokens_is_total_length(self):
        assert sld([], ["abc", "de"]) == 5

    @given(TOKSTR, TOKSTR)
    def test_symmetry(self, xt, yt):
        assert sld(xt, yt) == sld(yt, xt)

    @given(TOKSTR, TOKSTR, TOKSTR)
    @settings(max_examples=100, deadline=None)
    def test_triangle(self, xt, yt, zt):
        # Lemma 4: SLD is a metric.
        assert sld(xt, yt) + sld(yt, zt) >= sld(xt, zt)

    @given(TOKSTR, TOKSTR)
    def test_greedy_upper_bounds_exact(self, xt, yt):
        assert sld_greedy(xt, yt) >= sld(xt, yt)

    def test_greedy_can_be_suboptimal(self):
        # Greedy grabs the single cheapest edge first and pays for it.
        xt = ["ab", "cd"]
        yt = ["abx", "ab"]
        assert sld_greedy(xt, yt) >= sld(xt, yt)

    @given(TOKSTR)
    def test_greedy_identity(self, xt):
        assert sld_greedy(xt, xt) == 0


class TestNSLD:
    def test_paper_example(self):
        # NSLD({chan,kalan},{chank,alan}) = 2*2/(9+9+2) = 0.2 (§II-D.2)
        assert nsld(["chan", "kalan"], ["chank", "alan"]) == pytest.approx(0.2)

    def test_lemma5_empty_extreme(self):
        # Lemma 5 proof: empty vs non-empty gives exactly 1.
        assert nsld([], ["abc"]) == 1.0

    @given(TOKSTR, TOKSTR)
    def test_range(self, xt, yt):
        assert 0.0 <= nsld(xt, yt) <= 1.0

    @given(TOKSTR, TOKSTR)
    def test_symmetry(self, xt, yt):
        assert nsld(xt, yt) == pytest.approx(nsld(yt, xt))

    @given(TOKSTR, TOKSTR, TOKSTR)
    @settings(max_examples=100, deadline=None)
    def test_triangle(self, xt, yt, zt):
        # Theorem 2: NSLD is a metric.
        assert nsld(xt, yt) + nsld(yt, zt) >= nsld(xt, zt) - 1e-12

    @given(TOKSTR, TOKSTR)
    def test_lemma6_sandwich(self, xt, yt):
        lx, ly = agg_length(xt), agg_length(yt)
        if ly < lx:
            xt, yt, lx, ly = yt, xt, ly, lx
        if ly == 0:
            return
        v = nsld(xt, yt)
        assert v >= 1 - lx / ly - 1e-12
        assert v <= 2 / (lx / ly + 2) + 1e-12

    @given(TOKSTR, TOKSTR)
    def test_greedy_nsld_upper_bounds_exact(self, xt, yt):
        assert nsld_greedy(xt, yt) >= nsld(xt, yt) - 1e-12

    def test_nsld_from_sld(self):
        assert nsld_from_sld(2, 9, 9) == pytest.approx(0.2)
        assert nsld_from_sld(0, 0, 0) == 0.0


class TestTheorem3:
    """NSLD(x,y) <= T implies some token pair has NLD <= T."""

    @given(
        st.lists(TOKEN, min_size=1, max_size=4),
        st.lists(TOKEN, min_size=1, max_size=4),
        st.sampled_from([0.05, 0.1, 0.2, 0.3, 0.5]),
    )
    @settings(max_examples=300, deadline=None)
    def test_witness_token_pair_exists(self, xt, yt, t):
        from repro.core.levenshtein import nld

        if nsld(xt, yt) <= t:
            assert any(nld(a, b) <= t + 1e-12 for a in xt for b in yt)
