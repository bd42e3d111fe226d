"""Hungarian and greedy LSAP solvers vs brute force."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.baselines.assignment import (
    assignment_cost,
    brute_force_assignment,
    greedy_assignment,
    hungarian,
)


def _random_cost(n, seed):
    return np.random.default_rng(seed).random((n, n)) * 10


class TestHungarian:
    def test_identity_optimal(self):
        c = np.full((4, 4), 5.0)
        np.fill_diagonal(c, 0.0)
        a = hungarian(c)
        assert assignment_cost(c, a) == 0.0

    def test_known_3x3(self):
        c = np.array([[4.0, 1.0, 3.0], [2.0, 0.0, 5.0], [3.0, 2.0, 2.0]])
        a = hungarian(c)
        assert assignment_cost(c, a) == pytest.approx(5.0)

    def test_permutation_valid(self):
        a = hungarian(_random_cost(7, 0))
        assert sorted(a) == list(range(7))

    @given(st.integers(2, 7), st.integers(0, 10_000))
    @settings(max_examples=40, deadline=None)
    def test_matches_brute_force(self, n, seed):
        c = _random_cost(n, seed)
        a = hungarian(c)
        assert assignment_cost(c, a) == pytest.approx(
            brute_force_assignment(c)
        )

    def test_rectangular_rejected(self):
        with pytest.raises(ValueError):
            hungarian(np.zeros((2, 3)))

    def test_with_large_forbidden_entries(self):
        c = np.array([[1e9, 1.0], [2.0, 1e9]])
        a = hungarian(c)
        assert assignment_cost(c, a) == pytest.approx(3.0)


class TestGreedy:
    def test_permutation_valid(self):
        a = greedy_assignment(_random_cost(9, 3))
        assert sorted(a) == list(range(9))

    @given(st.integers(2, 6), st.integers(0, 10_000))
    @settings(max_examples=30, deadline=None)
    def test_never_beats_optimal(self, n, seed):
        c = _random_cost(n, seed)
        greedy = assignment_cost(c, greedy_assignment(c))
        opt = assignment_cost(c, hungarian(c))
        assert greedy >= opt - 1e-9

    def test_greedy_on_diagonal(self):
        c = np.full((3, 3), 9.0)
        np.fill_diagonal(c, 0.0)
        assert assignment_cost(c, greedy_assignment(c)) == 0.0
