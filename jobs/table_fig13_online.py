"""Entrypoint: Fig 13 — online/offline span ratio vs batch size.

Usage: spark-submit jobs/table_fig13_online.py
"""
from repro.experiments import fig13
from repro.experiments.common import emit


def main() -> None:
    emit("fig13_online", fig13.run(),
         "Online partitioning quality: online span / offline BOTTOM-UP "
         "span at version checkpoints ('-' = not a batch boundary).")


if __name__ == "__main__":
    main()
