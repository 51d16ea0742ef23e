"""Fig 9: effect of the subtree cap β on BOTTOM-UP (dataset B0).

For each β we report the total version span and the partitioning wall
time. Paper shape: span grows as β shrinks; runtime first falls with
smaller β, then rises again when merge overhead dominates.
"""
from __future__ import annotations

import time

import pandas as pd

from ..core.bottom_up import bottom_up_partition
from ..core.span import total_version_span_pd
from ..versioned.datasets import make
from ..versioned.membership import membership_pd

BETAS = (None, 80, 40, 20, 10, 5, 2)


def run(*, name: str = "B0s", scale: float = 1.0, C: int = 10_000,
        betas=BETAS) -> pd.DataFrame:
    ds = make(name, scale=scale)
    g = ds.graph
    mem = membership_pd(g, ds.records, ds.kills)
    rows = []
    for beta in betas:
        t0 = time.perf_counter()
        asg = bottom_up_partition(g, ds.records, ds.kills, C, beta=beta)
        dt = time.perf_counter() - t0
        rows.append({"beta": "inf" if beta is None else beta,
                     "total_span": total_version_span_pd(mem, asg),
                     "partition_time_s": round(dt, 3)})
    return pd.DataFrame(rows)
