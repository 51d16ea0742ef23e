"""Run every table job in one Spark session and persist all results
under ``results/`` (consumed by EXPERIMENTS.md).

Usage: spark-submit jobs/run_all.py
"""
import pandas as pd

from repro.experiments import (fig8, fig9, fig10, fig11, fig12, fig13,
                               sec23, table1, table2)
from repro.experiments.common import emit, get_spark, timed


def main() -> None:
    spark = get_spark("run-all")
    with timed() as t:
        emit("table_sec23_chunksize", sec23.run(spark))
        print(f"[sec23 done {t():.0f}s]")
        emit("table1_analytic", table1.analytic())
        emit("table1_empirical", table1.empirical())
        print(f"[table1 done {t():.0f}s]")
        emit("table2_datasets", table2.run())
        print(f"[table2 done {t():.0f}s]")
        emit("fig8_total_span", fig8.run(spark))
        print(f"[fig8 done {t():.0f}s]")
        emit("fig9_beta", fig9.run())
        print(f"[fig9 done {t():.0f}s]")
        emit("fig10_compression", pd.concat(
            [fig10.run_dataset(spark, n) for n in ("A2s", "C0s")],
            ignore_index=True))
        print(f"[fig10 done {t():.0f}s]")
        emit("fig11_queries", pd.concat(
            [fig11.run_dataset(spark, n) for n in ("A0s", "C0s")],
            ignore_index=True))
        print(f"[fig11 done {t():.0f}s]")
        emit("fig12_scalability", fig12.run())
        print(f"[fig12 done {t():.0f}s]")
        emit("fig13_online", fig13.run())
        print(f"[fig13 done {t():.0f}s]")


if __name__ == "__main__":
    main()
