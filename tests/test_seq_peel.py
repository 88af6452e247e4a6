"""Peeling (Algorithm 1) tests — the gold-standard κ_s oracle."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import seq
from repro.graph import generators as gen
from tests.helpers import RS_EXTRA, RS_MAIN, SMALL_GRAPHS, naive_peel


def _kappa(pdf, r, s):
    nuc, rids = seq.Nucleus.from_edges(pdf, r, s)
    return seq.peel(nuc), rids, nuc


class TestKnownDecompositions:
    @pytest.mark.parametrize("n", [3, 4, 5, 6, 7])
    def test_complete_graph_core(self, n):
        k, _, _ = _kappa(gen.complete_graph(n), 1, 2)
        assert (k == n - 1).all()

    @pytest.mark.parametrize("n", [4, 5, 6, 7])
    def test_complete_graph_truss(self, n):
        k, _, _ = _kappa(gen.complete_graph(n), 2, 3)
        assert (k == n - 2).all()

    @pytest.mark.parametrize("n", [5, 6, 7])
    def test_complete_graph_34(self, n):
        k, _, _ = _kappa(gen.complete_graph(n), 3, 4)
        assert (k == n - 3).all()

    def test_cycle_core_numbers(self):
        k, _, _ = _kappa(gen.cycle_graph(7), 1, 2)
        assert (k == 2).all()

    def test_star_core_numbers(self):
        k, _, _ = _kappa(gen.star_graph(6), 1, 2)
        assert (k == 1).all()

    def test_path_core_numbers(self):
        k, _, _ = _kappa(gen.path_graph(6), 1, 2)
        assert (k == 1).all()

    def test_fig3_core_numbers(self):
        # Paper Fig. 3: κ2 = {a:1, b:2, c:2, d:2, e:1, f:1}.
        k, rids, _ = _kappa(gen.fig3_graph(), 1, 2)
        assert dict(zip([r[0] for r in rids], k)) == {0: 1, 1: 2, 2: 2, 3: 2, 4: 1, 5: 1}

    def test_bowtie_truss(self):
        # Two triangles sharing vertex 2: every edge in exactly 1 triangle.
        k, _, _ = _kappa(SMALL_GRAPHS["bowtie"], 2, 3)
        assert (k == 1).all()

    def test_edge_with_no_triangle_gets_zero_truss(self):
        pdf = gen.from_edge_list([(0, 1), (1, 2), (0, 2), (2, 3)])
        k, rids, _ = _kappa(pdf, 2, 3)
        lookup = dict(zip(rids, k))
        assert lookup[(2, 3)] == 0
        assert lookup[(0, 1)] == 1

    def test_planted_clique_stands_out(self):
        pdf = gen.planted_cliques(1, 6, 10, 8, seed=0)
        k, rids, _ = _kappa(pdf, 1, 2)
        clique_k = [k[i] for i, rv in enumerate(rids) if rv[0] < 6]
        noise_k = [k[i] for i, rv in enumerate(rids) if rv[0] >= 6]
        assert min(clique_k) >= 5
        assert max(noise_k) < 5


class TestAgainstNaiveAlgorithm1:
    @pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
    @pytest.mark.parametrize("r,s", RS_MAIN)
    def test_bucket_peel_matches_naive(self, name, r, s):
        pdf = SMALL_GRAPHS[name]
        nuc, rids = seq.Nucleus.from_edges(pdf, r, s)
        fast = seq.peel(nuc)
        slow = naive_peel(nuc.n_r, [tuple(row) for row in nuc.scl])
        assert np.array_equal(fast, slow)

    @pytest.mark.parametrize("r,s", RS_EXTRA)
    def test_generalized_rs(self, r, s):
        pdf = SMALL_GRAPHS["gnp15"]
        nuc, _ = seq.Nucleus.from_edges(pdf, r, s)
        fast = seq.peel(nuc)
        slow = naive_peel(nuc.n_r, [tuple(row) for row in nuc.scl])
        assert np.array_equal(fast, slow)

    @given(st.lists(st.tuples(st.integers(0, 8), st.integers(0, 8)), min_size=1, max_size=20))
    @settings(max_examples=40, deadline=None)
    def test_random_graphs_core(self, pairs):
        pdf = gen.from_edge_list(pairs)
        if len(pdf) == 0:
            return
        nuc, _ = seq.Nucleus.from_edges(pdf, 1, 2)
        assert np.array_equal(
            seq.peel(nuc), naive_peel(nuc.n_r, [tuple(r) for r in nuc.scl])
        )


class TestKappaSemantics:
    @pytest.mark.parametrize("name", ["gnp15", "gnp20", "ws20"])
    def test_kcore_definition_holds(self, name):
        """Every vertex with κ2 = k lies in a subgraph of min degree k
        (check by repeatedly deleting vertices of degree < k)."""
        pdf = SMALL_GRAPHS[name]
        nuc, rids = seq.Nucleus.from_edges(pdf, 1, 2)
        kappa = seq.peel(nuc)
        vmap = {rv[0]: kappa[i] for i, rv in enumerate(rids)}
        import collections

        for kval in sorted(set(kappa)):
            adj = collections.defaultdict(set)
            for u, v in zip(pdf["src"], pdf["dst"]):
                adj[u].add(v)
                adj[v].add(u)
            # Peel to the k-core.
            changed = True
            alive = set(adj)
            while changed:
                changed = False
                for v in list(alive):
                    if len(adj[v] & alive) < kval:
                        alive.discard(v)
                        changed = True
            # every vertex with κ >= kval must be in the k-core
            for v, kv in vmap.items():
                if kv >= kval:
                    assert v in alive

    def test_empty_structure(self):
        nuc = seq.Nucleus(n_r=3, scl=np.zeros((0, 2), dtype=np.int64))
        assert seq.peel(nuc).tolist() == [0, 0, 0]
