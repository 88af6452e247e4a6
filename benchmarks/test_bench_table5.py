"""Table 5 benchmark: end-to-end peeling vs the local algorithm.

Mirrors jobs/table5.py: both sides include the Spark clique
enumeration, then either the sequential driver peel (baseline) or the
block-asynchronous AND iterations on Spark (local). Table 1 is the
(3,4) subset of these rows (tw-lite / wnd-lite / wiki-lite).
"""
import pytest

from repro.core.and_spark import and_block
from repro.core.peel_spark import peel_baseline
from repro.graph.cliques import membership

CASES = [
    ("wnd-lite", "k-core", 1, 2),
    ("wnd-lite", "k-truss", 2, 3),
    ("wnd-lite", "(3,4)", 3, 4),
    ("tw-lite", "(3,4)", 3, 4),
    ("wiki-lite", "k-truss", 2, 3),
]


@pytest.mark.parametrize("name,label,r,s", CASES)
def test_bench_peeling(benchmark, spark, bench_edges, bench_nucleus, name, label, r, s):
    E = bench_edges(name)

    def work():
        mem = membership(E, r, s)
        return peel_baseline(spark, E, r, s, mem=mem)

    out = benchmark.pedantic(work, rounds=1, iterations=1)
    from repro.core import seq

    rounds = seq.bulk_peel_rounds(bench_nucleus(name, r, s))
    benchmark.extra_info.update(
        {"graph": name, "decomp": label, "n_r": len(out),
         "distributed_peel_rounds": rounds}
    )
    assert len(out) > 0


@pytest.mark.parametrize("name,label,r,s", CASES)
def test_bench_local(benchmark, spark, bench_edges, name, label, r, s):
    E = bench_edges(name)

    def work():
        mem = membership(E, r, s)
        res = and_block(spark, E, r, s, mem=mem)
        res.kappa.count()
        return res

    res = benchmark.pedantic(work, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"graph": name, "decomp": label, "iterations": res.iterations}
    )
    assert res.iterations >= 0
