"""Benchmark: dataset generation throughput (Table 2 pipeline)."""
from repro.experiments import table2


def test_bench_table2_generation(benchmark):
    df = benchmark.pedantic(
        lambda: table2.run(scale=0.3, names=["A0s", "B0s", "C0s"]),
        rounds=1, iterations=1)
    assert len(df) == 3
