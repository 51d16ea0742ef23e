"""Benchmark for the Fig 13 online-partitioning quality loop."""
from repro.core.online import quality_ratio


def test_bench_fig13_online_quality(b0s, b0s_membership, benchmark):
    g, ds = b0s
    ratios = benchmark.pedantic(
        lambda: quality_ratio(g, ds.records, ds.kills, b0s_membership,
                              C=10_000, batch_size=25, checkpoints=[50, g.n]),
        rounds=1, iterations=1)
    assert all(r >= 0.9 for r in ratios.values())
