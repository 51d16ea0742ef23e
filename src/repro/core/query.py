"""Query processing (§2.4): Q1 full version, Q2 range, Q3 evolution,
and single-record retrieval, over the simulated KVS.

Each query consults the lossy projections to find candidate chunks,
fetches those chunks from the :class:`~repro.kvs.store.ChunkStore`
(request/byte traffic is accounted there), then uses the chunk maps to
extract exactly the requested records. Range/record queries AND the two
projections (index-ANDing); a fetched chunk may turn out to hold no
matching record — the lossy-projection artifact the paper notes.

Every method returns ``(DataFrame, QueryStats)`` where the stats carry
the span, bytes moved, and the calibrated simulated time.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..kvs.cost import CostModel, QUERY_MODEL
from ..kvs.store import ChunkStore
from .indexes import IndexSet


@dataclass
class QueryStats:
    span: int          # chunks fetched
    bytes: int         # chunk bytes moved
    sim_time_s: float  # calibrated retrieval time


class QueryEngine:
    """RStore's query processing module over a populated ChunkStore."""

    def __init__(self, spark: SparkSession, store: ChunkStore,
                 indexes: IndexSet, cost: CostModel = QUERY_MODEL):
        self.spark = spark
        self.store = store
        self.indexes = indexes
        self.cost = cost

    def _fetch(self, chunk_ids: list[int]) -> tuple[DataFrame, DataFrame, QueryStats]:
        nbytes = sum(self.indexes.chunk_bytes.get(c, 0) for c in chunk_ids)
        stats = QueryStats(span=len(chunk_ids), bytes=nbytes,
                           sim_time_s=self.cost.retrieval_time(len(chunk_ids), nbytes))
        recs = self.store.get_chunks(self.spark, chunk_ids)
        maps = self.store.get_chunk_maps(self.spark, chunk_ids)
        return recs, maps, stats

    def full_version(self, vid: int) -> tuple[DataFrame, QueryStats]:
        """Q1: all records belonging to version ``vid``."""
        ids = self.indexes.chunks_for_version(vid)
        recs, maps, stats = self._fetch(ids)
        wanted = maps.where(F.col("vid") == vid).select("key", "origin")
        out = recs.join(wanted, ["key", "origin"]).select(
            "key", "origin", "size", "payload")
        return out, stats

    def range_query(self, vid: int, key_lo: int,
                    key_hi: int) -> tuple[DataFrame, QueryStats]:
        """Q2: records of ``vid`` with ``key_lo <= key <= key_hi``.

        Index-ANDing: intersect the version's chunk list with the union
        of the chunk lists of keys in range.
        """
        v_chunks = set(self.indexes.chunks_for_version(vid))
        k_chunks: set[int] = set()
        for key, chunks in self.indexes.key_to_chunks.items():
            if key_lo <= key <= key_hi:
                k_chunks.update(chunks)
        ids = sorted(v_chunks & k_chunks)
        recs, maps, stats = self._fetch(ids)
        wanted = (maps.where(F.col("vid") == vid)
                  .where(F.col("key").between(key_lo, key_hi))
                  .select("key", "origin"))
        out = recs.join(wanted, ["key", "origin"]).select(
            "key", "origin", "size", "payload")
        return out, stats

    def record_evolution(self, key: int) -> tuple[DataFrame, QueryStats]:
        """Q3: every distinct record ever stored under ``key``."""
        ids = self.indexes.chunks_for_key(key)
        recs, _maps, stats = self._fetch(ids)
        out = recs.where(F.col("key") == key).select(
            "key", "origin", "size", "payload")
        return out, stats

    def record(self, key: int, vid: int) -> tuple[DataFrame, QueryStats]:
        """Point query: the record of ``key`` live in version ``vid``."""
        ids = sorted(set(self.indexes.chunks_for_version(vid))
                     & set(self.indexes.chunks_for_key(key)))
        recs, maps, stats = self._fetch(ids)
        wanted = (maps.where((F.col("vid") == vid) & (F.col("key") == key))
                  .select("key", "origin"))
        out = recs.join(wanted, ["key", "origin"]).select(
            "key", "origin", "size", "payload")
        return out, stats
