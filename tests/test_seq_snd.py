"""Sequential SND (Algorithm 2) tests."""
import numpy as np
import pytest

from repro.core import seq
from repro.graph import generators as gen
from tests.helpers import RS_EXTRA, RS_MAIN, SMALL_GRAPHS


class TestConvergesToKappa:
    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("r,s", RS_MAIN)
    def test_matches_peel(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        kappa = seq.peel(nuc)
        tau, _, _ = seq.snd_seq(nuc)
        assert np.array_equal(tau, kappa)

    @pytest.mark.parametrize("r,s", RS_EXTRA)
    def test_generalized_rs(self, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], r, s)
        assert np.array_equal(seq.snd_seq(nuc)[0], seq.peel(nuc))


class TestIterationBehaviour:
    def test_fig3_two_iterations(self):
        # The paper's Fig. 3: SND converges in two iterations.
        nuc, _ = seq.Nucleus.from_edges(gen.fig3_graph(), 1, 2)
        _, iters, _ = seq.snd_seq(nuc)
        assert iters == 2

    def test_fig3_tau_trace(self):
        # τ0 = degrees (2,3,2,2,2,1); τ1 = (2,2,2,2,1,1); τ2 = (1,2,2,2,1,1).
        nuc, _ = seq.Nucleus.from_edges(gen.fig3_graph(), 1, 2)
        _, _, hist = seq.snd_seq(nuc, track_history=True)
        assert hist[0].tolist() == [2, 3, 2, 2, 2, 1]
        assert hist[1].tolist() == [2, 2, 2, 2, 1, 1]
        assert hist[2].tolist() == [1, 2, 2, 2, 1, 1]

    def test_complete_graph_converges_instantly(self):
        # K_n degrees already equal κ — zero updating iterations.
        nuc, _ = seq.Nucleus.from_edges(gen.complete_graph(6), 1, 2)
        _, iters, _ = seq.snd_seq(nuc)
        assert iters == 0

    def test_max_iter_truncation_is_upper_bound(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 2, 3)
        kappa = seq.peel(nuc)
        for t in range(4):
            tau, _, _ = seq.snd_seq(nuc, max_iter=t)
            assert (tau >= kappa).all()

    def test_history_lengths(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp15"], 1, 2)
        _, iters, hist = seq.snd_seq(nuc, track_history=True)
        assert len(hist) == iters + 1

    def test_empty_graph_structure(self):
        nuc = seq.Nucleus(n_r=4, scl=np.zeros((0, 2), dtype=np.int64))
        tau, iters, _ = seq.snd_seq(nuc)
        assert iters == 0 and tau.tolist() == [0, 0, 0, 0]
