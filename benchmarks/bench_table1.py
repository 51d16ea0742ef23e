"""Benchmark for the Table 1 empirical cross-check."""
from repro.experiments import table1


def test_bench_table1_empirical(benchmark):
    df = benchmark.pedantic(
        lambda: table1.empirical(n=40, m_v=200), rounds=1, iterations=1)
    rows = {r["algorithm"]: r for _, r in df.iterrows()}
    assert rows["DELTA"]["point_queries"] > rows["SubChunk"]["point_queries"]
