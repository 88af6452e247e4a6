"""Reference (pure-Python) clique enumeration tests."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graph import generators as gen
from repro.graph import local as gl
from tests.helpers import SMALL_GRAPHS


def _random_edges(pairs):
    return gen.from_edge_list(pairs)


edge_strategy = st.lists(
    st.tuples(st.integers(0, 9), st.integers(0, 9)), min_size=1, max_size=25
)


class TestKCliques:
    @pytest.mark.parametrize("k", [1, 2, 3, 4])
    def test_matches_brute_force_on_small_graphs(self, k):
        for name, pdf in SMALL_GRAPHS.items():
            if len(pdf) > 40:
                continue
            assert gl.k_cliques(pdf, k) == gl.brute_k_cliques(pdf, k), (name, k)

    @given(edge_strategy)
    @settings(max_examples=60, deadline=None)
    def test_matches_brute_force_random(self, pairs):
        pdf = _random_edges(pairs)
        if len(pdf) == 0:
            return
        for k in (2, 3, 4):
            assert gl.k_cliques(pdf, k) == gl.brute_k_cliques(pdf, k)

    def test_complete_graph_counts(self):
        from math import comb

        pdf = gen.complete_graph(6)
        for k in (1, 2, 3, 4):
            assert len(gl.k_cliques(pdf, k)) == comb(6, k)

    def test_triangle_free_graph(self):
        pdf = gen.cycle_graph(8)
        assert gl.k_cliques(pdf, 3) == []
        assert gl.k_cliques(pdf, 4) == []

    def test_cliques_are_sorted_tuples(self):
        pdf = SMALL_GRAPHS["gnp15"]
        for cl in gl.k_cliques(pdf, 3):
            assert list(cl) == sorted(cl)

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            gl.k_cliques(SMALL_GRAPHS["k5"], 0)


class TestMembershipLocal:
    @pytest.mark.parametrize("r,s", [(1, 2), (2, 3), (3, 4), (1, 3), (2, 4)])
    def test_shapes(self, r, s):
        from math import comb

        pdf = SMALL_GRAPHS["k6"]
        rids, scliques = gl.membership_local(pdf, r, s)
        assert len(rids) == comb(6, r)
        assert len(scliques) == comb(6, s)
        for S in scliques:
            assert len(S) == comb(s, r)
            assert len(set(S)) == len(S)

    def test_invalid_rs(self):
        with pytest.raises(ValueError):
            gl.membership_local(SMALL_GRAPHS["k5"], 2, 2)

    def test_k_core_membership_is_edge_incidence(self):
        pdf = SMALL_GRAPHS["fig3"]
        rids, scliques = gl.membership_local(pdf, 1, 2)
        # every s-clique (edge) has exactly its two endpoint vertices
        assert len(scliques) == len(pdf)
        d = gl.s_degrees_local(len(rids), scliques)
        deg = np.bincount(np.r_[pdf["src"], pdf["dst"]], minlength=6)
        assert d.tolist() == deg.tolist()

    def test_s_degrees_truss_on_k5(self):
        pdf = SMALL_GRAPHS["k5"]
        rids, scliques = gl.membership_local(pdf, 2, 3)
        d = gl.s_degrees_local(len(rids), scliques)
        assert (d == 3).all()  # every edge of K5 is in 3 triangles
