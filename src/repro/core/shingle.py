"""SHINGLE partitioning (§3.1, Algorithms 1–2) — pure Spark.

For every record, ``l`` min-hashes are computed over the set of versions
it belongs to (``min over versions of xxhash64(i, vid)`` for hash
function ``i``). Records are sorted lexicographically by their shingle
vector — placing records whose version sets overlap heavily next to each
other — and packed into fixed-size chunks by a running byte-sum window.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .chunking import pack_window


def shingle_partition(membership: DataFrame, C: int, *, l: int = 4,
                      seed: int = 42) -> DataFrame:
    """Return the assignment ``(key, origin, size, chunk)``.

    ``membership`` is the ``(vid, key, origin, size)`` relation from
    :func:`repro.versioned.membership.membership_spark`. Every record
    appears in at least one version (its origin), so no record is lost.
    """
    if l < 1:
        raise ValueError("need at least one hash function")
    aggs = [F.min(F.xxhash64(F.lit(seed), F.lit(i), F.col("vid"))).alias(f"sh{i}")
            for i in range(l)]
    shingles = (membership.groupBy("key", "origin")
                .agg(F.first("size").alias("size"), *aggs))
    order = [F.col(f"sh{i}") for i in range(l)] + [F.col("key"), F.col("origin")]
    packed = pack_window(shingles, C, order)
    return packed.select("key", "origin", "size", "chunk")
