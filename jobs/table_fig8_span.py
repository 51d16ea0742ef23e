"""Entrypoint: Fig 8 — total version span per partitioner per dataset.

Usage: spark-submit jobs/table_fig8_span.py
"""
from repro.experiments import fig8
from repro.experiments.common import emit, get_spark


def main() -> None:
    spark = get_spark("table-fig8")
    emit("fig8_total_span", fig8.run(spark),
         "Total version span (chunks fetched to rebuild every version), "
         "no compression, scaled datasets, C=10KB.")


if __name__ == "__main__":
    main()
