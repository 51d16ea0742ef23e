"""Entrypoint: Fig 12 — weak scaling (nodes 1..16, data doubling).

Usage: spark-submit jobs/table_fig12_scalability.py
"""
from repro.experiments import fig12
from repro.experiments.common import emit


def main() -> None:
    emit("fig12_scalability", fig12.run(),
         "Weak scaling: versions double with node count; BOTTOM-UP layout; "
         "parallel requests, sequential chunk processing (§5.5).")


if __name__ == "__main__":
    main()
