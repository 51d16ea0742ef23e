"""Benchmark for the §2.3 chunk-size experiment (T-chunk)."""
from repro.experiments import sec23


def test_bench_sec23_chunk_size_sweep(spark, benchmark):
    df = benchmark.pedantic(
        lambda: sec23.run(spark, n_records=200_000, version_size=20_000,
                          chunk_sizes=(1, 10, 100, 1000)),
        rounds=1, iterations=1)
    assert (df["sim_time_s"].diff().dropna() <= 0).all()
