"""The paper's theorems, asserted on randomized inputs.

Theorem 1: monotonicity and κ lower bound of τ_t.
Theorem 2: κ is non-decreasing across degree levels.
Theorem 3: r-cliques in level L_i converge within i iterations.
Theorem 4: κ-sorted AND order converges in one iteration
(tested in test_seq_and.py).
"""
import numpy as np
import pytest

from repro.core import seq
from tests.helpers import RS_MAIN, SMALL_GRAPHS

GRAPHS = ["fig3", "gnp15", "gnp20", "ws20", "ba20", "planted"]


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("r,s", RS_MAIN)
class TestTheorem1:
    def test_monotonicity(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        _, _, hist = seq.snd_seq(nuc, track_history=True)
        for a, b in zip(hist, hist[1:]):
            assert (b <= a).all()

    def test_lower_bound(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        kappa = seq.peel(nuc)
        _, _, hist = seq.snd_seq(nuc, track_history=True)
        for tau_t in hist:
            assert (tau_t >= kappa).all()


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("r,s", RS_MAIN)
class TestTheorem2:
    def test_kappa_nondecreasing_across_levels(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        kappa = seq.peel(nuc)
        _, lv = seq.degree_levels_full(nuc)
        # max κ at level i must be <= min κ at any level j > i... actually
        # Thm 2 states κ(R_i) <= κ(R_j) for i <= j, i.e. the per-level
        # maxima of the *lower* level never exceed higher-level minima.
        n_levels = lv.max() + 1 if lv.size else 0
        mins = np.array([kappa[lv == i].min() for i in range(n_levels)])
        maxs = np.array([kappa[lv == i].max() for i in range(n_levels)])
        running_max = np.maximum.accumulate(maxs)
        for i in range(1, n_levels):
            assert running_max[i - 1] <= mins[i]


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("r,s", RS_MAIN)
class TestTheorem3:
    def test_level_i_converges_by_iteration_i(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        kappa = seq.peel(nuc)
        _, lv = seq.degree_levels_full(nuc)
        _, _, hist = seq.snd_seq(nuc, track_history=True)
        for i in range(int(lv.max()) + 1 if lv.size else 0):
            t = min(i, len(hist) - 1)
            sel = lv == i
            assert np.array_equal(hist[t][sel], kappa[sel]), f"level {i}"
