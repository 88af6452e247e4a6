"""Unit & property tests for the h-index kernels (paper §2.2, §4.3)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hindex import h_index, h_index_naive, h_index_rows


class TestHIndexNaive:
    def test_empty(self):
        assert h_index_naive([]) == 0

    def test_single_zero(self):
        assert h_index_naive([0]) == 0

    def test_single_positive(self):
        assert h_index_naive([7]) == 1

    def test_classic_example(self):
        # 5 papers with citations 10, 8, 5, 4, 3 -> h = 4
        assert h_index_naive([10, 8, 5, 4, 3]) == 4

    def test_all_equal(self):
        assert h_index_naive([3, 3, 3]) == 3
        assert h_index_naive([3, 3, 3, 3, 3]) == 3

    def test_ones(self):
        assert h_index_naive([1, 1, 1, 1]) == 1

    def test_large_values_capped_by_count(self):
        assert h_index_naive([100, 100]) == 2


class TestHIndexLinear:
    @pytest.mark.parametrize(
        "vals,expected",
        [
            ([], 0),
            ([0], 0),
            ([1], 1),
            ([2, 2, 1, 1], 2),
            ([10, 8, 5, 4, 3], 4),
            ([5] * 5, 5),
            ([1000], 1),
            ([0, 0, 0], 0),
        ],
    )
    def test_known_values(self, vals, expected):
        assert h_index(np.array(vals, dtype=np.int64)) == expected

    @given(st.lists(st.integers(min_value=0, max_value=50), max_size=60))
    @settings(max_examples=200, deadline=None)
    def test_matches_naive(self, vals):
        assert h_index(np.array(vals, dtype=np.int64)) == h_index_naive(vals)

    @given(st.lists(st.integers(min_value=0, max_value=10**6), max_size=30))
    @settings(max_examples=100, deadline=None)
    def test_matches_naive_large_values(self, vals):
        assert h_index(np.array(vals, dtype=np.int64)) == h_index_naive(vals)

    def test_definition_property(self):
        # H(K) = largest h such that >= h elements of K are >= h.
        rng = np.random.default_rng(0)
        for _ in range(50):
            vals = rng.integers(0, 20, rng.integers(0, 25))
            h = h_index(vals)
            assert (vals >= h).sum() >= h
            assert (vals >= h + 1).sum() < h + 1


class TestHIndexRows:
    def test_empty(self):
        out = h_index_rows(np.array([], dtype=np.int64), np.array([], dtype=np.int64), 3)
        assert out.tolist() == [0, 0, 0]

    def test_single_group(self):
        g = np.zeros(5, dtype=np.int64)
        v = np.array([10, 8, 5, 4, 3], dtype=np.int64)
        assert h_index_rows(g, v, 1).tolist() == [4]

    def test_two_groups_interleaved(self):
        g = np.array([0, 1, 0, 1, 0], dtype=np.int64)
        v = np.array([3, 1, 3, 5, 3], dtype=np.int64)
        out = h_index_rows(g, v, 2)
        assert out[0] == 3  # {3,3,3}
        assert out[1] == 1  # {1,5}

    def test_missing_group_gets_zero(self):
        g = np.array([2, 2], dtype=np.int64)
        v = np.array([4, 4], dtype=np.int64)
        assert h_index_rows(g, v, 4).tolist() == [0, 0, 2, 0]

    @given(
        st.lists(
            st.tuples(
                st.integers(min_value=0, max_value=5),
                st.integers(min_value=0, max_value=12),
            ),
            max_size=60,
        )
    )
    @settings(max_examples=150, deadline=None)
    def test_matches_per_group_naive(self, rows):
        g = np.array([r[0] for r in rows], dtype=np.int64)
        v = np.array([r[1] for r in rows], dtype=np.int64)
        out = h_index_rows(g, v, 6)
        for grp in range(6):
            vals = v[g == grp]
            assert out[grp] == h_index_naive(vals.tolist())
