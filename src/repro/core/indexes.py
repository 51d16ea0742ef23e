"""Indexes and lossy projections (§2.4, Fig 3b).

The full 3-D mapping M(K, V, C) is kept as per-chunk *chunk maps*
(stored with the chunks in the KVS) plus two lossy in-memory projections
on the application server:

- ``version_to_chunks``: which chunks contain records of a version,
- ``key_to_chunks``: which chunks contain records of a primary key.

Both are built by one Spark aggregation over membership ⋈ assignment and
collected into driver hash maps — the paper uses in-memory hashmaps too
and reports their sizes (we expose :func:`index_sizes_bytes` for the
same measurement).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass
class IndexSet:
    """Driver-side lossy projections + chunk byte sizes."""

    version_to_chunks: dict   # vid -> sorted list[int]
    key_to_chunks: dict       # key -> sorted list[int]
    chunk_bytes: dict         # chunk -> bytes

    def chunks_for_version(self, vid: int) -> list[int]:
        return self.version_to_chunks.get(int(vid), [])

    def chunks_for_key(self, key: int) -> list[int]:
        return self.key_to_chunks.get(int(key), [])

    def sizes_bytes(self) -> dict:
        """Approximate in-memory footprint of each projection, counting 8
        bytes per stored id (adjacency-list representation, §2.4)."""
        v2c = sum(1 + len(v) for v in self.version_to_chunks.values()) * 8
        k2c = sum(1 + len(v) for v in self.key_to_chunks.values()) * 8
        return {"version_to_chunks": v2c, "key_to_chunks": k2c}


def chunk_map_df(membership: DataFrame, assignment: DataFrame) -> DataFrame:
    """Per-chunk slice of M: ``(chunk, vid, key, origin)``."""
    return (membership.join(assignment.select("key", "origin", "chunk"),
                            ["key", "origin"])
            .select("chunk", "vid", "key", "origin"))


def build_indexes(membership: DataFrame, assignment: DataFrame) -> IndexSet:
    """Build both lossy projections with two Spark aggregations."""
    cm = chunk_map_df(membership, assignment)
    v2c_rows = (cm.groupBy("vid")
                .agg(F.sort_array(F.collect_set("chunk")).alias("chunks"))
                .collect())
    k2c_rows = (assignment.groupBy("key")
                .agg(F.sort_array(F.collect_set("chunk")).alias("chunks"))
                .collect())
    bytes_rows = (assignment.groupBy("chunk")
                  .agg(F.sum("size").alias("bytes")).collect())
    return IndexSet(
        version_to_chunks={int(r["vid"]): [int(c) for c in r["chunks"]]
                           for r in v2c_rows},
        key_to_chunks={int(r["key"]): [int(c) for c in r["chunks"]]
                       for r in k2c_rows},
        chunk_bytes={int(r["chunk"]): int(r["bytes"]) for r in bytes_rows},
    )
