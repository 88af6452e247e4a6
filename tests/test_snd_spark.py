"""Spark SND (the paper's core as Catalyst dataflow) — correctness tests."""
import numpy as np
import pytest

from repro.core import seq
from repro.core.snd import snd
from repro.graph import cliques as gc
from repro.graph import edges as ged
from tests.helpers import RS_MAIN, SMALL_GRAPHS

GRAPHS = ["fig3", "k6", "gnp15", "gnp20", "ws20", "planted"]


def _gold(name, r, s):
    nuc, rids = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
    kappa = seq.peel(nuc)
    return {rv: int(k) for rv, k in zip(rids, kappa)}, nuc


def _collected(res, r):
    vcols = [f"v{i + 1}" for i in range(r)]
    pdf = res.to_pandas()
    return {
        tuple(int(row[c]) for c in vcols): int(row["kappa"])
        for _, row in pdf.iterrows()
    }


@pytest.mark.parametrize("name", GRAPHS)
@pytest.mark.parametrize("r,s", RS_MAIN)
class TestSndMatchesPeel:
    def test_kappa(self, spark, name, r, s):
        # frontier=False here: the frontier path gets its own parity
        # test below, and the plain path is ~3x faster at toy scale.
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        gold, _ = _gold(name, r, s)
        res = snd(spark, E, r, s, frontier=False)
        assert _collected(res, r) == gold


class TestIterationParity:
    @pytest.mark.parametrize("name", ["fig3", "gnp15", "ws20"])
    @pytest.mark.parametrize("r,s", [(1, 2), (2, 3)])
    def test_matches_sequential_snd_iterations(self, spark, name, r, s):
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        _, seq_iters, _ = seq.snd_seq(nuc)
        res = snd(spark, E, r, s, frontier=False)
        assert res.iterations == seq_iters

    def test_fig3_two_iterations(self, spark):
        E = ged.from_pandas(spark, SMALL_GRAPHS["fig3"])
        assert snd(spark, E, 1, 2).iterations == 2

    def test_frontier_off_same_result(self, spark):
        E = ged.from_pandas(spark, SMALL_GRAPHS["gnp15"])
        a = snd(spark, E, 2, 3, frontier=True)
        b = snd(spark, E, 2, 3, frontier=False)
        assert _collected(a, 2) == _collected(b, 2)
        assert a.iterations == b.iterations


class TestApproximation:
    def test_max_iter_gives_upper_bound(self, spark):
        name = "gnp20"
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        gold, _ = _gold(name, 2, 3)
        res = snd(spark, E, 2, 3, max_iter=1, frontier=False)
        approx = _collected(res, 2)
        assert set(approx) == set(gold)
        assert all(approx[k] >= gold[k] for k in gold)

    def test_history_callback_monotone(self, spark):
        E = ged.from_pandas(spark, SMALL_GRAPHS["ws20"])
        snaps = []
        snd(spark, E, 1, 2, frontier=False, history_cb=lambda i, pdf: snaps.append(
            pdf.sort_values("rid")["tau"].to_numpy()))
        assert len(snaps) >= 1
        for a, b in zip(snaps, snaps[1:]):
            assert (b <= a).all()

    def test_membership_reuse(self, spark):
        E = ged.from_pandas(spark, SMALL_GRAPHS["gnp15"])
        mem = gc.membership(E, 2, 3)
        res = snd(spark, E, 2, 3, mem=mem, frontier=False)
        gold, _ = _gold("gnp15", 2, 3)
        assert _collected(res, 2) == gold


class TestGeneralizedRs:
    @pytest.mark.parametrize("r,s", [(1, 3), (2, 4)])
    def test_nonstandard_pairs(self, spark, r, s):
        name = "gnp15"
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        gold, _ = _gold(name, r, s)
        res = snd(spark, E, r, s, frontier=False)
        assert _collected(res, r) == gold
