"""Table 4 benchmark: iteration counts & bound at bench scale.

Times the sequential SND / AND sweeps and the degree-levels bound on
the collected structure (enumeration excluded — it is Table 3/5's
cost), and records the Table-4 numbers (levels, snd, and) as
extra_info on each benchmark entry.
"""
import pytest

from repro.core import seq

CASES = [
    ("fb-lite", "k-core", 1, 2),
    ("fb-lite", "k-truss", 2, 3),
    ("fb-lite", "(3,4)", 3, 4),
    ("wnd-lite", "k-truss", 2, 3),
    ("wnd-lite", "(3,4)", 3, 4),
]


@pytest.mark.parametrize("name,label,r,s", CASES)
def test_bench_snd_iterations(benchmark, bench_nucleus, name, label, r, s):
    nuc = bench_nucleus(name, r, s)

    def work():
        _, iters, _ = seq.snd_seq(nuc)
        return iters

    iters = benchmark.pedantic(work, rounds=1, iterations=1)
    levels = seq.degree_levels(nuc)
    benchmark.extra_info.update(
        {"graph": name, "decomp": label, "snd_iters": iters, "degree_levels": levels}
    )
    assert iters <= levels


@pytest.mark.parametrize("name,label,r,s", CASES)
def test_bench_and_iterations(benchmark, bench_nucleus, name, label, r, s):
    nuc = bench_nucleus(name, r, s)

    def work():
        _, iters, comps, _ = seq.and_seq(nuc)
        return iters, comps

    iters, comps = benchmark.pedantic(work, rounds=1, iterations=1)
    _, snd_iters, _ = seq.snd_seq(nuc)
    benchmark.extra_info.update(
        {"graph": name, "decomp": label, "and_iters": iters,
         "tau_computations": comps, "snd_iters": snd_iters}
    )
    assert iters <= snd_iters
