"""Benchmark for the Fig 12 weak-scaling experiment."""
from repro.experiments import fig12


def test_bench_fig12_weak_scaling(benchmark):
    df = benchmark.pedantic(
        lambda: fig12.run_dataset("G~", base_versions=30, n_base=200,
                                  pct_update=10, nodes=(1, 2, 4)),
        rounds=1, iterations=1)
    assert df["avg_version_span"].is_monotonic_increasing
