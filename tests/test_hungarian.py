"""Unit tests for the assignment solver (no scipy in the container)."""
import itertools

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hungarian import assignment_min_cost


def brute_force(cost):
    n = len(cost)
    return min(
        sum(cost[i][p[i]] for i in range(n)) for p in itertools.permutations(range(n))
    )


class TestAssignment:
    def test_empty(self):
        assert assignment_min_cost([]) == (0.0, [])

    def test_single(self):
        total, cols = assignment_min_cost([[7]])
        assert total == 7
        assert cols == [0]

    def test_identity_diagonal(self):
        cost = [[0, 9, 9], [9, 0, 9], [9, 9, 0]]
        total, cols = assignment_min_cost(cost)
        assert total == 0
        assert cols == [0, 1, 2]

    def test_classic_example(self):
        cost = [[4, 1, 3], [2, 0, 5], [3, 2, 2]]
        total, _ = assignment_min_cost(cost)
        assert total == 5

    def test_rectangular_rejected(self):
        with pytest.raises(ValueError):
            assignment_min_cost([[1, 2]])

    def test_assignment_is_permutation(self):
        cost = [[3, 1, 2], [1, 3, 2], [2, 2, 1]]
        _, cols = assignment_min_cost(cost)
        assert sorted(cols) == [0, 1, 2]

    @given(
        st.integers(min_value=1, max_value=6).flatmap(
            lambda n: st.lists(
                st.lists(st.integers(min_value=0, max_value=20), min_size=n, max_size=n),
                min_size=n,
                max_size=n,
            )
        )
    )
    @settings(max_examples=200)
    def test_matches_brute_force(self, cost):
        total, cols = assignment_min_cost(cost)
        assert sorted(cols) == list(range(len(cost)))
        assert total == pytest.approx(brute_force(cost))
        assert total == pytest.approx(sum(cost[i][cols[i]] for i in range(len(cost))))
