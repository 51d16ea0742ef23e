"""Benchmarks for Fig 10: sub-chunk construction + zlib compression."""
import pytest

from repro.core.subchunks import build_subchunks, compress_subchunks


@pytest.mark.parametrize("k", [5, 25])
def test_bench_fig10_subchunk_pipeline(c0s_payload, benchmark, k):
    g, ds = c0s_payload

    def pipeline():
        sc = build_subchunks(g, ds.records, k=k)
        return compress_subchunks(ds.records, sc, g.depths())

    cs = benchmark.pedantic(pipeline, rounds=1, iterations=1)
    assert cs["comp_bytes"].sum() < cs["raw_bytes"].sum()
