"""Spark peeling baselines vs the sequential gold standard."""
import numpy as np
import pytest

from repro.core import seq
from repro.core.peel_spark import peel_baseline, peel_distributed
from repro.graph import cliques as gc
from repro.graph import edges as ged
from tests.helpers import RS_MAIN, SMALL_GRAPHS


def _gold_by_rid(spark, name, r, s):
    """Gold κ keyed by packed rid (via the Spark membership keying)."""
    E = ged.from_pandas(spark, SMALL_GRAPHS[name])
    mem = gc.membership(E, r, s)
    base = peel_baseline(spark, E, r, s, mem=mem)
    return E, mem, base


@pytest.mark.parametrize("name", ["fig3", "gnp15", "ws20"])
@pytest.mark.parametrize("r,s", RS_MAIN)
class TestBaselineMatchesSeq:
    def test_matches_local_nucleus(self, spark, name, r, s):
        E, mem, base = _gold_by_rid(spark, name, r, s)
        # Independent path: pure-Python membership + peel, matched by
        # unpacking rid keys back to vertex tuples.
        nuc, rids = seq.Nucleus.from_edges(SMALL_GRAPHS[name], r, s)
        kappa = seq.peel(nuc)
        gold = {rv: int(k) for rv, k in zip(rids, kappa)}
        vcols = [f"v{i + 1}" for i in range(r)]
        rmap = {
            int(row["rid"]): tuple(int(row[c]) for c in vcols)
            for row in mem.rdf.collect()
        }
        got = {
            rmap[int(rid)]: int(k)
            for rid, k in zip(base["rid"], base["kappa"])
        }
        assert got == gold


class TestDistributedPeel:
    @pytest.mark.parametrize("name", ["fig3", "gnp15"])
    @pytest.mark.parametrize("r,s", [(1, 2), (2, 3)])
    def test_matches_baseline(self, spark, name, r, s):
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        mem = gc.membership(E, r, s)
        a = peel_baseline(spark, E, r, s, mem=mem)
        b = peel_distributed(spark, E, r, s, mem=mem)
        assert np.array_equal(a["rid"].to_numpy(), b["rid"].to_numpy())
        assert np.array_equal(a["kappa"].to_numpy(), b["kappa"].to_numpy())

    def test_34_on_k6(self, spark):
        E = ged.from_pandas(spark, SMALL_GRAPHS["k6"])
        out = peel_distributed(spark, E, 3, 4)
        assert set(out["kappa"]) == {3}

    @pytest.mark.parametrize("name", ["fig3", "gnp15"])
    def test_wave_count_matches_simulation(self, spark, name):
        """The distributed peel's synchronized removal waves equal the
        seq-engine simulation used by the Table-5 cost model."""
        E = ged.from_pandas(spark, SMALL_GRAPHS[name])
        mem = gc.membership(E, 1, 2)
        _, rounds = peel_distributed(spark, E, 1, 2, mem=mem, with_rounds=True)
        nuc, _ = seq.Nucleus.from_edges(SMALL_GRAPHS[name], 1, 2)
        assert rounds == seq.bulk_peel_rounds(nuc)
