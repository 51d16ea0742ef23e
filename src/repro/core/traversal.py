"""DEPTH-FIRST / BREADTH-FIRST partitioning (§3.3, Algorithm 4).

Traverse the version tree from the root; as each version is visited,
append the records that originated there (its Δ⁺) to the current chunk,
spilling into fresh chunks as they fill — Example 5's greedy layout. The
only difference between the two variants is the traversal order, so both
reduce to: rank versions, order records by (origin rank, key), pack
sequentially. On linear chains they coincide.

These are metadata-scale driver computations (one row per distinct
record); span evaluation and storage run through Spark.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .chunking import pack_ordered


def _partition_by_rank(records: pd.DataFrame, rank: dict[int, int],
                       C: int) -> pd.DataFrame:
    df = records[["key", "origin", "size"]].copy()
    df["_rank"] = df["origin"].map(rank)
    df = df.sort_values(["_rank", "key"], kind="mergesort").reset_index(drop=True)
    ids, _ = pack_ordered(df["size"].to_numpy(), C)
    df["chunk"] = ids
    return df.drop(columns="_rank")


def dfs_partition(graph, records: pd.DataFrame, C: int) -> pd.DataFrame:
    """DEPTH-FIRST layout: assignment ``(key, origin, size, chunk)``."""
    rank = {v: i for i, v in enumerate(graph.dfs_order())}
    return _partition_by_rank(records, rank, C)


def bfs_partition(graph, records: pd.DataFrame, C: int) -> pd.DataFrame:
    """BREADTH-FIRST layout: assignment ``(key, origin, size, chunk)``."""
    rank = {v: i for i, v in enumerate(graph.bfs_order())}
    return _partition_by_rank(records, rank, C)
