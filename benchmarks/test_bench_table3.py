"""Table 3 benchmark: distributed |V|/|E|/|△|/|K4| counting throughput."""
import pytest

from repro.graph.cliques import graph_counts

GRAPHS = ["fb-lite", "slj-lite", "wiki-lite"]


@pytest.mark.parametrize("name", GRAPHS)
def test_bench_graph_counts(benchmark, bench_edges, name):
    E = bench_edges(name)

    def work():
        return graph_counts(E)

    counts = benchmark.pedantic(work, rounds=1, iterations=1)
    benchmark.extra_info.update(counts)
    assert counts["V"] > 0 and counts["E"] > 0
