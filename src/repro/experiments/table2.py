"""Table 2: descriptions of the (scaled) datasets.

Generates every spec in :mod:`repro.versioned.datasets` and reports the
same columns the paper reports, next to the paper's values for the
unscaled original.
"""
from __future__ import annotations

import pandas as pd

from ..versioned.datasets import SPECS, make

# Paper's Table 2 for reference columns (unscaled originals).
PAPER = {
    "A0": (300, 300.0, "100K", 50, "Random", 12_355_366, 11.9, 31.67),
    "A1": (300, 300.0, "100K", 5, "Skewed", 1_510_097, 5.77, 140.14),
    "A2": (300, 300.0, "100K", 5, "Random", 1_343_434, 5.14, 141.26),
    "B0": (1001, 293.5, "100K", 5, "Skewed", 4_175_023, 8.0, 192.24),
    "B1": (1001, 293.5, "100K", 5, "Random", 4_216_366, 8.07, 193.77),
    "B2": (1001, 293.5, "100K", 10, "Random", 8_349_864, 8.02, 195.69),
    "C0": (10001, 143.0, "20K", 10, "Random", 16_532_342, 15.95, 196.46),
    "C1": (10001, 143.0, "20K", 1, "Random", 1_758_517, 1.69, 193.01),
    "C2": (10001, 143.0, "20K", 5, "Skewed", 8_169_026, 7.87, 193.05),
    "D0": (10002, 94.4, "20K", 10, "Random", 16_621_314, 16.03, 196.48),
    "D1": (10002, 94.4, "20K", 1, "Random", 1_773_281, 1.71, 193.07),
    "D2": (10002, 94.4, "20K", 5, "Skewed", 8_195_193, 7.9, 193.09),
    "E": (10001, 170.0, "20K", 10, "Random", 16_524_584, 78.96, 972.84),
    "F": (1001, 56.0, "100K", 20, "Random", 16_665_072, 79.64, 981.11),
}


def run(*, scale: float = 1.0, names=None) -> pd.DataFrame:
    rows = []
    for name in (names or SPECS):
        spec = SPECS[name]
        ds = make(name, scale=scale)
        g = ds.graph
        p = PAPER[spec.paper_name]
        rows.append({
            "dataset": name, "paper": spec.paper_name,
            "versions": g.n, "paper_versions": p[0],
            "avg_depth": round(g.avg_leaf_depth(), 1), "paper_depth": p[1],
            "recs_per_version": int(ds.version_counts.mean()),
            "pct_update": spec.pct_update, "update_type": spec.update_type,
            "unique_records": ds.n_unique, "paper_unique": p[5],
            "unique_mb": round(ds.unique_bytes / 1e6, 2),
            "total_mb": round(ds.total_bytes / 1e6, 2),
            "paper_total_gb": p[7],
        })
    return pd.DataFrame(rows)
