"""Degree levels (Definition 6) and the convergence bound (§3.1)."""
import numpy as np
import pytest

from repro.core import seq
from repro.graph import generators as gen
from tests.helpers import RS_MAIN, SMALL_GRAPHS


class TestLevelStructure:
    def test_complete_graph_single_level(self):
        nuc, _ = seq.Nucleus.from_edges(gen.complete_graph(5), 1, 2)
        n, lv = seq.degree_levels_full(nuc)
        assert n == 1
        assert (lv == 0).all()

    def test_cycle_single_level(self):
        nuc, _ = seq.Nucleus.from_edges(gen.cycle_graph(6), 1, 2)
        assert seq.degree_levels(nuc) == 1

    def test_star_two_levels(self):
        # Leaves (degree 1) form L0; the hub's degree then drops to 0 -> L1.
        nuc, rids = seq.Nucleus.from_edges(gen.star_graph(4), 1, 2)
        n, lv = seq.degree_levels_full(nuc)
        assert n == 2
        hub = [i for i, rv in enumerate(rids) if rv[0] == 0][0]
        assert lv[hub] == 1

    def test_every_clique_assigned_a_level(self):
        for name in ("gnp15", "ws20", "planted"):
            nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], 2, 3)
            n, lv = seq.degree_levels_full(nuc)
            assert (lv >= 0).all()
            assert lv.max() == n - 1
            # levels are contiguous
            assert set(np.unique(lv)) == set(range(n))

    def test_empty_structure(self):
        nuc = seq.Nucleus(n_r=0, scl=np.zeros((0, 2), dtype=np.int64))
        assert seq.degree_levels(nuc) == 0


class TestConvergenceBound:
    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("r,s", RS_MAIN)
    def test_snd_iterations_within_levels(self, name, r, s):
        """Lemma 2: SND converges within (number of levels) iterations."""
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        levels = seq.degree_levels(nuc)
        _, iters, _ = seq.snd_seq(nuc)
        assert iters <= levels

    def test_levels_bound_tighter_than_clique_count(self):
        # §3.1: the trivial bound is |R(G)|; levels should be far tighter
        # on a clustered graph.
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS["ws20"], 2, 3)
        assert seq.degree_levels(nuc) < nuc.n_r


class TestBulkPeelRounds:
    def test_complete_graph_one_round(self):
        nuc, _ = seq.Nucleus.from_edges(gen.complete_graph(6), 1, 2)
        assert seq.bulk_peel_rounds(nuc) == 1

    def test_path_removes_in_waves(self):
        # P5, k-core: wave 1 removes the two endpoints, wave 2 the next
        # two, wave 3 the middle vertex -> 3 rounds at k = 1.
        nuc, _ = seq.Nucleus.from_edges(gen.path_graph(5), 1, 2)
        assert seq.bulk_peel_rounds(nuc) == 3

    @pytest.mark.parametrize("name", ["fig3", "gnp15", "gnp20", "ws20", "planted"])
    @pytest.mark.parametrize("r,s", RS_MAIN)
    def test_positive_and_bounded(self, name, r, s):
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        rounds = seq.bulk_peel_rounds(nuc)
        assert 1 <= rounds <= nuc.n_r

    def test_empty(self):
        nuc = seq.Nucleus(n_r=0, scl=np.zeros((0, 2), dtype=np.int64))
        assert seq.bulk_peel_rounds(nuc) == 0
