"""Entrypoint: Fig 10 — span + compression ratio vs sub-chunk size k.

Usage: spark-submit jobs/table_fig10_compression.py
"""
import pandas as pd

from repro.experiments import fig10
from repro.experiments.common import emit, get_spark


def main() -> None:
    spark = get_spark("table-fig10")
    tables = [fig10.run_dataset(spark, name) for name in ("A2s", "C0s")]
    emit("fig10_compression", pd.concat(tables, ignore_index=True),
         "Total version span and zlib compression ratio vs max sub-chunk "
         "size k, for P_d ∈ {10,5,1}% (datasets A2s, C0s; C=10KB).")


if __name__ == "__main__":
    main()
