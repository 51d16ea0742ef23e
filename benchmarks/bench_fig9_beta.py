"""Benchmarks for Fig 9: BOTTOM-UP runtime at different β caps."""
import pytest

from repro.core.bottom_up import bottom_up_partition

C = 10_000


@pytest.mark.parametrize("beta", [None, 20, 5])
def test_bench_fig9_bottom_up_beta(b0s, benchmark, beta):
    g, ds = b0s
    asg = benchmark.pedantic(
        lambda: bottom_up_partition(g, ds.records, ds.kills, C, beta=beta),
        rounds=1, iterations=1)
    assert len(asg) == ds.n_unique
