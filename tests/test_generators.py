"""Tests for the synthetic graph generators (dataset substitution layer)."""
import numpy as np
import pandas as pd
import pytest

from repro.graph import generators as gen
from repro.graph import local as gl


def _assert_canonical(pdf: pd.DataFrame):
    assert list(pdf.columns) == ["src", "dst"]
    assert (pdf["src"] < pdf["dst"]).all()
    assert not pdf.duplicated().any()


class TestBasicShapes:
    def test_complete_graph_edge_count(self):
        for n in (2, 4, 7):
            assert len(gen.complete_graph(n)) == n * (n - 1) // 2

    def test_cycle_graph(self):
        pdf = gen.cycle_graph(6)
        _assert_canonical(pdf)
        assert len(pdf) == 6
        deg = np.bincount(np.r_[pdf["src"], pdf["dst"]])
        assert (deg == 2).all()

    def test_star_graph(self):
        pdf = gen.star_graph(5)
        _assert_canonical(pdf)
        assert len(pdf) == 5
        deg = np.bincount(np.r_[pdf["src"], pdf["dst"]], minlength=6)
        assert deg[0] == 5 and (deg[1:] == 1).all()

    def test_path_graph(self):
        pdf = gen.path_graph(5)
        assert len(pdf) == 4

    def test_fig3_graph_degrees(self):
        # Paper Fig. 3 trace: degrees a:2 b:3 c:2 d:2 e:2 f:1.
        pdf = gen.fig3_graph()
        deg = np.bincount(np.r_[pdf["src"], pdf["dst"]], minlength=6)
        assert deg.tolist() == [2, 3, 2, 2, 2, 1]

    def test_from_edge_list_canonicalizes(self):
        pdf = gen.from_edge_list([(2, 1), (1, 2), (3, 3), (0, 1)])
        _assert_canonical(pdf)
        assert len(pdf) == 2  # (1,2) deduped, (3,3) loop dropped

    def test_from_edge_list_empty(self):
        pdf = gen.from_edge_list([])
        assert len(pdf) == 0


class TestRandomGenerators:
    @pytest.mark.parametrize("maker", [
        lambda s: gen.gnp(30, 0.2, seed=s),
        lambda s: gen.watts_strogatz(30, 4, 0.2, seed=s),
        lambda s: gen.barabasi_albert(30, 3, seed=s, closure=0.4),
        lambda s: gen.rmat(5, 4, seed=s),
        lambda s: gen.planted_cliques(2, 5, 10, 12, seed=s),
    ])
    def test_deterministic_and_canonical(self, maker):
        a, b = maker(7), maker(7)
        pd.testing.assert_frame_equal(a, b)
        _assert_canonical(a)
        c = maker(8)
        # Different seed should (overwhelmingly) give a different graph.
        assert not a.equals(c)

    def test_gnp_extremes(self):
        assert len(gen.gnp(10, 0.0, seed=0)) == 0
        assert len(gen.gnp(10, 1.0, seed=0)) == 45

    def test_gnp_validation(self):
        with pytest.raises(ValueError):
            gen.gnp(5, 1.5)

    def test_ws_validation(self):
        with pytest.raises(ValueError):
            gen.watts_strogatz(10, 3, 0.1)  # odd k
        with pytest.raises(ValueError):
            gen.watts_strogatz(4, 4, 0.1)  # k >= n

    def test_ws_zero_rewire_is_lattice(self):
        pdf = gen.watts_strogatz(12, 4, 0.0, seed=0)
        deg = np.bincount(np.r_[pdf["src"], pdf["dst"]], minlength=12)
        assert (deg == 4).all()

    def test_ba_validation(self):
        with pytest.raises(ValueError):
            gen.barabasi_albert(5, 0)
        with pytest.raises(ValueError):
            gen.barabasi_albert(3, 3)

    def test_ba_vertex_count(self):
        pdf = gen.barabasi_albert(40, 3, seed=1)
        assert int(max(pdf["src"].max(), pdf["dst"].max())) == 39

    def test_ba_closure_increases_triangles(self):
        plain = gen.barabasi_albert(60, 3, seed=2, closure=0.0)
        closed = gen.barabasi_albert(60, 3, seed=2, closure=0.9)
        t0 = len(gl.k_cliques(plain, 3))
        t1 = len(gl.k_cliques(closed, 3))
        assert t1 > t0

    def test_rmat_dense_ids(self):
        pdf = gen.rmat(6, 4, seed=3)
        ids = np.unique(np.r_[pdf["src"], pdf["dst"]])
        assert ids.min() == 0
        assert ids.max() == ids.size - 1

    def test_rmat_validation(self):
        with pytest.raises(ValueError):
            gen.rmat(4, 4, a=0.6, b=0.3, c=0.2)

    def test_planted_cliques_contains_cliques(self):
        pdf = gen.planted_cliques(3, 4, 5, 6, seed=0)
        adj = gl.adjacency(pdf)
        for ci in range(3):
            base = ci * 4
            for i in range(4):
                for j in range(i + 1, 4):
                    assert base + j in adj[base + i]

    def test_planted_cliques_dropout_removes_edges(self):
        full = gen.planted_cliques(4, 8, 0, 0, seed=1, bridge_per_clique=0)
        eroded = gen.planted_cliques(4, 8, 0, 0, seed=1, bridge_per_clique=0,
                                     dropout=0.3)
        assert len(eroded) < len(full)

    def test_planted_cliques_size_jitter_varies_block_sizes(self):
        pdf = gen.planted_cliques(6, 10, 0, 0, seed=2, bridge_per_clique=0,
                                  size_jitter=4)
        uniform = gen.planted_cliques(6, 10, 0, 0, seed=2, bridge_per_clique=0)
        # jittered blocks should not reproduce the uniform vertex count
        n_j = int(max(pdf["src"].max(), pdf["dst"].max())) + 1
        assert n_j != 60 or len(pdf) != len(uniform)

    def test_planted_cliques_jitter_makes_convergence_nontrivial(self):
        """The whole point of the jitter/dropout knobs: a uniform block
        suite converges in 0 iterations (τ0 = κ), the eroded one
        should not."""
        from repro.core import seq

        eroded = gen.load("wnd-lite", "unit")
        nuc, _ = seq.Nucleus.from_edges(eroded, 1, 2)
        _, iters, _ = seq.snd_seq(nuc)
        assert iters >= 1


class TestSuite:
    def test_suite_keys_match_paper_names(self):
        assert set(gen.SUITE_UNIT) == set(gen.PAPER_NAMES)
        assert set(gen.SUITE_BENCH) == set(gen.PAPER_NAMES)

    @pytest.mark.parametrize("name", sorted(gen.SUITE_UNIT))
    def test_unit_suite_loads_and_is_canonical(self, name):
        pdf = gen.load(name, "unit")
        _assert_canonical(pdf)
        assert len(pdf) > 0

    def test_bench_graphs_are_larger(self):
        for name in ("fb-lite", "wnd-lite"):
            assert len(gen.load(name, "bench")) > len(gen.load(name, "unit"))

    def test_unknown_scale_raises(self):
        with pytest.raises(ValueError):
            gen.suite("huge")
