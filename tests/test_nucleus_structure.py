"""Invariants of the in-memory Nucleus (CSR incidence) structure."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import seq
from repro.graph import generators as gen
from repro.graph import local as gl
from tests.helpers import SMALL_GRAPHS


class TestCsrInvariants:
    @pytest.mark.parametrize("name", ["fig3", "k5", "gnp15", "ws20"])
    @pytest.mark.parametrize("r,s", [(1, 2), (2, 3)])
    def test_incidence_consistency(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        # degrees == incidence-list lengths == membership multiplicity
        d = nuc.degrees()
        flat = nuc.scl.ravel()
        counts = np.bincount(flat, minlength=nuc.n_r)
        assert np.array_equal(d, counts)
        for rid in range(nuc.n_r):
            for si in nuc.incident(rid):
                assert rid in nuc.scl[si]

    def test_members_per_sclique(self):
        from math import comb

        for r, s in [(1, 2), (2, 3), (3, 4), (2, 4)]:
            nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["k6"], r, s)
            assert nuc.c == comb(s, r)

    def test_empty(self):
        nuc = seq.Nucleus(n_r=5, scl=np.zeros((0, 3), dtype=np.int64))
        assert nuc.n_s == 0
        assert nuc.degrees().tolist() == [0] * 5

    @given(st.lists(st.tuples(st.integers(0, 7), st.integers(0, 7)), min_size=1, max_size=18))
    @settings(max_examples=40, deadline=None)
    def test_degrees_match_local_reference(self, pairs):
        pdf = gen.from_edge_list(pairs)
        if len(pdf) == 0:
            return
        nuc, rids = seq.Nucleus.from_edges(pdf, 1, 2)
        ref = gl.s_degrees_local(
            len(rids), gl.membership_local(pdf, 1, 2)[1]
        )
        assert np.array_equal(nuc.degrees(), ref)


class TestFromPandasMembership:
    def test_roundtrip_matches_local(self):
        """Building from (sid, rid) rows (the Spark collection path) must
        produce the same decomposition as the direct local path."""
        pdf = SMALL_GRAPHS["gnp15"]
        rids, scliques = gl.membership_local(pdf, 2, 3)
        # Fake packed keys: index * 7 + 3 (arbitrary, strictly increasing).
        keys = np.arange(len(rids)) * 7 + 3
        rows = []
        for si, S in enumerate(scliques):
            for m in S:
                rows.append((si, keys[m]))
        mdf = pd.DataFrame(rows, columns=["sid", "rid"])
        nuc, out_keys = seq.nucleus_from_pandas_membership(keys, mdf, 3)
        ref, _ = seq.Nucleus.from_edges(pdf, 2, 3)
        assert np.array_equal(out_keys, keys)
        assert np.array_equal(seq.peel(nuc), seq.peel(ref))

    def test_bad_multiplicity_raises(self):
        keys = np.array([0, 1, 2])
        mdf = pd.DataFrame({"sid": [0, 0], "rid": [0, 1]})
        with pytest.raises(ValueError):
            seq.nucleus_from_pandas_membership(keys, mdf, 3)

    def test_empty_membership(self):
        keys = np.array([10, 20])
        nuc, out = seq.nucleus_from_pandas_membership(
            keys, pd.DataFrame({"sid": [], "rid": []}), 2
        )
        assert nuc.n_s == 0 and nuc.n_r == 2
