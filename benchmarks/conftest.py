"""Benchmark-local fixtures: pre-generated datasets shared across
benchmarks so pytest-benchmark times only the kernel under test."""
import pytest

from repro.versioned.datasets import make
from repro.versioned.membership import membership_pd

BENCH_SCALE = 0.4  # ~SF 0.1-equivalent for the scaled datasets


@pytest.fixture(scope="session")
def b0s():
    ds = make("B0s", scale=BENCH_SCALE)
    return ds.graph, ds


@pytest.fixture(scope="session")
def b0s_membership(b0s):
    g, ds = b0s
    return membership_pd(g, ds.records, ds.kills)


@pytest.fixture(scope="session")
def c0s_payload():
    ds = make("C0s", scale=BENCH_SCALE, with_payload=True, p_d=0.05)
    return ds.graph, ds
