"""Entrypoint: Fig 9 — BOTTOM-UP span/runtime vs subtree cap β (B0s).

Usage: spark-submit jobs/table_fig9_beta.py
"""
from repro.experiments import fig9
from repro.experiments.common import emit


def main() -> None:
    emit("fig9_beta", fig9.run(),
         "Effect of subtree size β on BOTTOM-UP (dataset B0s).")


if __name__ == "__main__":
    main()
