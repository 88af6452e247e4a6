"""Tests for the strict Kendall-Tau and accuracy metrics (paper §5.2)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.convergence import (
    accuracy,
    kendall_tau_naive,
    kendall_tau_strict,
)

lists = st.lists(st.integers(0, 8), min_size=0, max_size=40)


class TestKendallTauStrict:
    def test_identical_lists(self):
        assert kendall_tau_strict([1, 2, 3], [1, 2, 3]) == 1.0

    def test_identical_with_ties(self):
        assert kendall_tau_strict([1, 1, 2], [1, 1, 2]) == 1.0

    def test_scale_invariant_concordance(self):
        # Same order relations, different values -> still 1.0.
        assert kendall_tau_strict([1, 2, 3], [10, 20, 30]) == 1.0

    def test_reversed_distinct(self):
        assert kendall_tau_strict([1, 2, 3, 4], [4, 3, 2, 1]) == -1.0

    def test_half_tie_is_discordant(self):
        # x tied, y not -> the single pair is discordant (paper's strictness).
        assert kendall_tau_strict([1, 1], [1, 2]) == -1.0

    def test_empty_and_singleton(self):
        assert kendall_tau_strict([], []) == 1.0
        assert kendall_tau_strict([5], [7]) == 1.0

    def test_length_mismatch(self):
        with pytest.raises(ValueError):
            kendall_tau_strict([1], [1, 2])

    @given(st.tuples(lists, lists))
    @settings(max_examples=120, deadline=None)
    def test_matches_naive(self, xy):
        x, y = xy
        n = min(len(x), len(y))
        x, y = x[:n], y[:n]
        fast = kendall_tau_strict(x, y)
        slow = kendall_tau_naive(x, y)
        assert fast == pytest.approx(slow)

    def test_large_input_runs(self):
        rng = np.random.default_rng(0)
        x = rng.integers(0, 50, 20000)
        y = x.copy()
        assert kendall_tau_strict(x, y) == 1.0


class TestAccuracy:
    def test_all_equal(self):
        assert accuracy([1, 2, 3], [1, 2, 3]) == 1.0

    def test_half(self):
        assert accuracy([1, 2, 3, 4], [1, 2, 0, 0]) == 0.5

    def test_empty(self):
        assert accuracy([], []) == 1.0

    def test_mismatch_raises(self):
        with pytest.raises(ValueError):
            accuracy([1], [])
