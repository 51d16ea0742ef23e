"""Entrypoint: Table 1 — analytic trade-offs + empirical cross-check.

Usage: spark-submit jobs/table1_tradeoffs.py  (no cluster work; runs on
the driver, kept as a job for uniformity).
"""
from repro.experiments import table1
from repro.experiments.common import emit


def main() -> None:
    emit("table1_analytic", table1.analytic(),
         "Table 1 closed forms at n=100, m_v=100K, d=0.1, c=0.2, s=100B, "
         "s_c=1MB (bytes / query counts).")
    emit("table1_empirical", table1.empirical(),
         "Measured on a generated chain (n=60, m_v=400, d=0.1, 200B "
         "records, 4KB chunks; zlib where the layout compresses).")


if __name__ == "__main__":
    main()
