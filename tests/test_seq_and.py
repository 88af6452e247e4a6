"""Sequential AND (Algorithm 3) tests, incl. the notification mechanism."""
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
        tau, _, _, _ = seq.and_seq(nuc)
        assert np.array_equal(tau, kappa)

    @pytest.mark.parametrize("r,s", RS_EXTRA)
    def test_generalized_rs(self, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], r, s)
        assert np.array_equal(seq.and_seq(nuc)[0], seq.peel(nuc))

    @pytest.mark.parametrize("seed", [0, 1, 2, 3])
    def test_random_orders_converge(self, seed):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 2, 3)
        kappa = seq.peel(nuc)
        rng = np.random.default_rng(seed)
        order = rng.permutation(nuc.n_r)
        tau, _, _, _ = seq.and_seq(nuc, order=order)
        assert np.array_equal(tau, kappa)

    def test_notification_off_same_result(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["ws20"], 2, 3)
        t1, i1, _, _ = seq.and_seq(nuc, notify=True)
        t2, i2, _, _ = seq.and_seq(nuc, notify=False)
        assert np.array_equal(t1, t2)
        assert i1 == i2  # notification skips work, not updates


class TestFasterThanSnd:
    @pytest.mark.parametrize("name", ["gnp15", "gnp20", "ws20", "ba20", "planted", "fig3"])
    @pytest.mark.parametrize("r,s", RS_MAIN)
    def test_iterations_at_most_snd(self, name, r, s):
        """AND with latest values never needs more sweeps than SND
        (the paper: SND is AND's worst case)."""
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        _, snd_iters, _ = seq.snd_seq(nuc)
        _, and_iters, _, _ = seq.and_seq(nuc)
        assert and_iters <= snd_iters

    def test_notification_reduces_computations(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 1, 2)
        _, _, c_notify, _ = seq.and_seq(nuc, notify=True)
        _, iters, c_plain, _ = seq.and_seq(nuc, notify=False)
        # plain AND recomputes everything every sweep (+ final idle sweep)
        assert c_plain == nuc.n_r * (iters + 1)
        assert c_notify < c_plain

    def test_fig5_computation_count(self):
        """Paper Fig. 5: AND + notification on the Fig-3 graph, natural
        (alphabetical) order: 8 τ computations."""
        nuc, _ = seq.Nucleus.from_edges(gen.fig3_graph(), 1, 2)
        _, iters, comps, _ = seq.and_seq(nuc, notify=True)
        assert comps == 8
        assert iters == 2  # sweeps with >= 1 update (a in sweep 1... see below)

    def test_theorem4_kappa_order_single_iteration(self):
        """Theorem 4: processing in non-decreasing κ order (the peeling
        removal order) converges in a single iteration. Note a *naive*
        argsort(κ) tie order is not sufficient — on the Fig-3 graph
        processing a before e needs 2 sweeps — so we use the peel order."""
        for name in ("fig3", "gnp15", "gnp20", "ws20", "planted"):
            nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], 1, 2)
            kappa, order = seq.peel_full(nuc)
            assert (np.diff(kappa[order]) >= 0).all()  # κ-non-decreasing
            tau, iters, _, _ = seq.and_seq(nuc, order=order)
            assert np.array_equal(tau, kappa)
            assert iters <= 1, name

    def test_theorem4_truss(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 2, 3)
        kappa, order = seq.peel_full(nuc)
        tau, iters, _, _ = seq.and_seq(nuc, order=order)
        assert np.array_equal(tau, kappa)
        assert iters <= 1

    def test_history_snapshots_monotone(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 2, 3)
        _, _, _, hist = seq.and_seq(nuc, track_history=True)
        for a, b in zip(hist, hist[1:]):
            assert (b <= a).all()

    def test_max_iter_truncation_upper_bound(self):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["gnp20"], 2, 3)
        kappa = seq.peel(nuc)
        tau, _, _, _ = seq.and_seq(nuc, max_iter=1)
        assert (tau >= kappa).all()
