"""Benchmark for the Fig 11 query-performance sweep."""
from repro.experiments import fig11


def test_bench_fig11_query_sweep(spark, benchmark):
    df = benchmark.pedantic(
        lambda: fig11.run_dataset(spark, "C0s", scale=0.3, k_values=(1, 5)),
        rounds=1, iterations=1)
    sub = df[df.algorithm == "SUBCHUNK"].iloc[0]
    bu = df[(df.algorithm == "BOTTOMUP") & (df.k == 1)].iloc[0]
    assert sub["q1_s"] > bu["q1_s"]      # SUBCHUNK worst at Q1
    assert sub["q3_s"] < bu["q3_s"] * 5  # but competitive at Q3
