"""Entrypoint: Table 2 — generate every scaled dataset and report its
statistics next to the paper's originals.

Usage: spark-submit jobs/table2_datasets.py
"""
from repro.experiments import table2
from repro.experiments.common import emit


def main() -> None:
    emit("table2_datasets", table2.run(),
         "Scaled (~1/100) Table-2 datasets; paper_* columns are the "
         "unscaled originals.")


if __name__ == "__main__":
    main()
