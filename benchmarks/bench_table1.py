"""Benchmark for Table 1: dataset statistics computation."""


def test_bench_table1_stats(benchmark, bench_dblp):
    stats = benchmark.pedantic(bench_dblp.graph.stats, rounds=3, iterations=1)
    assert stats["node_types"] == 4 and stats["edge_types"] == 4
