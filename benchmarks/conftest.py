"""Benchmark fixtures: bench-scale graphs and memoized memberships."""
import pytest


@pytest.fixture(scope="session")
def bench_edges(spark):
    """name -> checkpointed canonical edge DataFrame at bench scale."""
    from repro.graph import edges as ged
    from repro.graph import generators as gen

    cache = {}

    def get(name: str):
        if name not in cache:
            cache[name] = ged.from_pandas(spark, gen.load(name, "bench")).localCheckpoint(
                eager=True
            )
        return cache[name]

    return get


@pytest.fixture(scope="session")
def bench_nucleus(spark, bench_edges):
    """(name, r, s) -> collected sequential Nucleus (enumeration excluded
    from the timed region of Table-4 benches)."""
    from jobs.table4 import nucleus_for

    cache = {}

    def get(name: str, r: int, s: int):
        key = (name, r, s)
        if key not in cache:
            nuc, keys, mem = nucleus_for(spark, bench_edges(name), r, s)
            cache[key] = nuc
        return cache[key]

    return get
