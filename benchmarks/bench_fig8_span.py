"""Benchmarks for the Fig 8 span comparison: one per partitioner, on the
same pre-generated B0s dataset, so relative runtimes are comparable."""
from repro.core.baselines import delta_partition, delta_total_span
from repro.core.bottom_up import bottom_up_partition
from repro.core.shingle import shingle_partition
from repro.core.span import total_version_span_pd
from repro.core.traversal import bfs_partition, dfs_partition
from repro.versioned.membership import membership_spark

C = 10_000


def test_bench_fig8_bottom_up(b0s, b0s_membership, benchmark):
    g, ds = b0s
    asg = benchmark.pedantic(
        lambda: bottom_up_partition(g, ds.records, ds.kills, C),
        rounds=1, iterations=1)
    assert total_version_span_pd(b0s_membership, asg) > 0


def test_bench_fig8_dfs(b0s, b0s_membership, benchmark):
    g, ds = b0s
    asg = benchmark.pedantic(lambda: dfs_partition(g, ds.records, C),
                             rounds=1, iterations=1)
    assert len(asg) == ds.n_unique


def test_bench_fig8_bfs(b0s, benchmark):
    g, ds = b0s
    asg = benchmark.pedantic(lambda: bfs_partition(g, ds.records, C),
                             rounds=1, iterations=1)
    assert len(asg) == ds.n_unique


def test_bench_fig8_shingle(spark, b0s, benchmark):
    g, ds = b0s
    mem = membership_spark(spark, g, ds.spark_records(spark),
                           ds.spark_kills(spark)).cache()
    mem.count()  # materialize outside the timed region

    asg = benchmark.pedantic(
        lambda: shingle_partition(mem, C).toPandas(), rounds=1, iterations=1)
    assert len(asg) == ds.n_unique


def test_bench_fig8_delta(b0s, benchmark):
    g, ds = b0s
    asg = benchmark.pedantic(lambda: delta_partition(g, ds.records, C),
                             rounds=1, iterations=1)
    assert delta_total_span(g, asg) > 0
