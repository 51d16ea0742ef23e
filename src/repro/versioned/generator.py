"""Synthetic versioned-dataset generator (§5.1).

Follows the paper's recipe: generate a version graph with the method of
[4] (see :func:`repro.versioned.graph.random_tree`), create a base version
of JSON-like records with auto-incremented primary keys and random payloads
of the requisite size, then derive every other version from its parent by
updating/deleting a fraction of the live records (uniform or Zipf-skewed
key selection) and inserting new ones. When a record is updated, the
child's payload differs from the parent's by at most ``p_d`` (Fig 10's
knob), so zlib compression of same-key records behaves like the paper's
record-level compression.

Deltas are generated along a DFS of the version tree with an undo log, so
memory stays O(records-per-version) regardless of version count, and every
version's RNG is seeded by ``(seed, vid)`` for order-independence.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from .graph import VersionGraph

_RECORDS_SCHEMA = T.StructType([
    T.StructField("key", T.LongType(), False),
    T.StructField("origin", T.LongType(), False),
    T.StructField("size", T.LongType(), False),
    T.StructField("payload", T.StringType(), True),
])

_KILLS_SCHEMA = T.StructType([
    T.StructField("key", T.LongType(), False),
    T.StructField("origin", T.LongType(), False),
    T.StructField("kill_vid", T.LongType(), False),
])


@dataclass
class VersionedDataset:
    """A generated multi-version dataset plus summary statistics."""

    graph: VersionGraph
    records: pd.DataFrame  # key, origin, size, payload — distinct records
    kills: pd.DataFrame    # key, origin, kill_vid
    config: dict = field(default_factory=dict)
    version_bytes: np.ndarray | None = None   # logical size of each version
    version_counts: np.ndarray | None = None  # records in each version

    @property
    def n_unique(self) -> int:
        return len(self.records)

    @property
    def unique_bytes(self) -> int:
        return int(self.records["size"].sum())

    @property
    def total_bytes(self) -> int:
        """Sum of logical version sizes (Table 2 'Total size')."""
        return int(self.version_bytes.sum())

    def spark_records(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.records, schema=_RECORDS_SCHEMA)

    def spark_kills(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.kills, schema=_KILLS_SCHEMA)

    def sizes(self) -> dict:
        """Composite key → record size, for driver-side packers."""
        return {(int(k), int(o)): int(s)
                for k, o, s in zip(self.records["key"], self.records["origin"],
                                   self.records["size"])}


def _rand_payload(g: np.random.Generator, size: int) -> np.ndarray:
    return g.integers(97, 123, size, dtype=np.uint8)  # 'a'..'z'


def _mutate(g: np.random.Generator, payload: np.ndarray, p_d: float) -> np.ndarray:
    """Copy ``payload`` changing a contiguous ~``p_d`` fraction of it."""
    out = payload.copy()
    span = max(1, int(round(p_d * len(out))))
    off = int(g.integers(0, max(1, len(out) - span + 1)))
    out[off:off + span] = _rand_payload(g, span)
    return out


def generate(graph: VersionGraph, *, n_base: int, pct_update: float,
             update_type: str = "random", record_size=100,
             p_d: float = 0.1, zipf_alpha: float = 1.1,
             frac_delete: float = 0.1, frac_insert: float = 0.1,
             with_payload: bool = True, seed: int = 0) -> VersionedDataset:
    """Generate a dataset over ``graph``; see module docstring.

    ``pct_update`` is the Table-2 '%update': fraction (in percent) of a
    version's live records touched when deriving a child. Of the touched
    budget, ``frac_delete`` are deletions and ``frac_insert`` fresh
    insertions; the rest are in-place updates (kill + re-add with mutated
    payload). ``record_size`` is an int (fixed) or ``(lo, hi)`` for
    per-key sizes drawn once at key creation.
    """
    if update_type not in ("random", "zipf"):
        raise ValueError(f"update_type must be random|zipf, got {update_type}")

    def _size_for(g: np.random.Generator) -> int:
        if isinstance(record_size, tuple):
            return int(g.integers(record_size[0], record_size[1] + 1))
        return int(record_size)

    rec_key: list[int] = []
    rec_origin: list[int] = []
    rec_size: list[int] = []
    rec_payload: list = []
    kill_rows: list[tuple[int, int, int]] = []

    def _emit(key: int, origin: int, size: int, payload) -> None:
        rec_key.append(key)
        rec_origin.append(origin)
        rec_size.append(size)
        rec_payload.append(payload.tobytes().decode("ascii")
                           if payload is not None else None)

    # Live state along the DFS path.
    live_origin: dict[int, int] = {}
    live_size: dict[int, int] = {}
    live_payload: dict[int, np.ndarray] = {}
    live_bytes = 0
    next_key = n_base
    version_bytes = np.zeros(graph.n, dtype=np.int64)
    version_counts = np.zeros(graph.n, dtype=np.int64)

    g0 = np.random.default_rng((seed, 0))
    root_payloads = {}
    for k in range(n_base):
        size = _size_for(g0)
        pl = _rand_payload(g0, size) if with_payload else None
        root_payloads[k] = pl
        live_origin[k] = 0
        live_size[k] = size
        if with_payload:
            live_payload[k] = pl
        live_bytes += size
        _emit(k, 0, size, pl)
    version_bytes[0] = live_bytes
    version_counts[0] = n_base

    # Iterative DFS with undo so sibling branches see identical parent state.
    undo_stack: list[list] = []
    stack: list[tuple[int, int]] = [(0, 1)]
    for c in reversed(graph.children[0]):
        stack.append((c, 0))

    while stack:
        v, phase = stack.pop()
        if phase == 1:
            if v != 0:
                for key, o, s, pl in reversed(undo_stack.pop()):
                    if key in live_origin:
                        live_bytes -= live_size[key]
                        del live_origin[key]
                        del live_size[key]
                        live_payload.pop(key, None)
                    if o is not None:
                        live_origin[key] = o
                        live_size[key] = s
                        live_bytes += s
                        if pl is not None:
                            live_payload[key] = pl
            continue
        g = np.random.default_rng((seed, v))
        log: list = []  # (key, prev_origin|None, prev_size, prev_payload)
        n_live = len(live_origin)
        n_change = max(1, int(round(pct_update / 100.0 * n_live)))
        n_del = int(round(frac_delete * n_change))
        n_ins = int(round(frac_insert * n_change))
        n_upd = max(0, n_change - n_del - n_ins)
        n_touch = min(n_del + n_upd, n_live)

        keys = np.fromiter(live_origin.keys(), dtype=np.int64, count=n_live)
        keys.sort()
        if update_type == "zipf":
            w = 1.0 / np.arange(1, n_live + 1, dtype=np.float64) ** zipf_alpha
            w /= w.sum()
            chosen = g.choice(keys, size=n_touch, replace=False, p=w)
        else:
            chosen = g.choice(keys, size=n_touch, replace=False)
        dels, upds = chosen[:min(n_del, n_touch)], chosen[min(n_del, n_touch):]

        for key in dels:
            key = int(key)
            o = live_origin.pop(key)
            s = live_size.pop(key)
            pl = live_payload.pop(key, None)
            live_bytes -= s
            kill_rows.append((key, o, v))
            log.append((key, o, s, pl))
        for key in upds:
            key = int(key)
            o = live_origin[key]
            s = live_size[key]
            pl = live_payload.get(key)
            kill_rows.append((key, o, v))
            log.append((key, o, s, pl))
            new_pl = _mutate(g, pl, p_d) if pl is not None else None
            live_origin[key] = v
            if new_pl is not None:
                live_size[key] = len(new_pl)
                live_payload[key] = new_pl
            _emit(key, v, live_size[key], new_pl)
        for _ in range(n_ins):
            key = next_key
            next_key += 1
            size = _size_for(g)
            pl = _rand_payload(g, size) if with_payload else None
            live_origin[key] = v
            live_size[key] = size
            if pl is not None:
                live_payload[key] = pl
            live_bytes += size
            log.append((key, None, None, None))
            _emit(key, v, size, pl)

        version_bytes[v] = live_bytes
        version_counts[v] = len(live_origin)
        undo_stack.append(log)
        stack.append((v, 1))
        for c in reversed(graph.children[v]):
            stack.append((c, 0))

    records = pd.DataFrame({
        "key": np.array(rec_key, dtype=np.int64),
        "origin": np.array(rec_origin, dtype=np.int64),
        "size": np.array(rec_size, dtype=np.int64),
        "payload": rec_payload,
    })
    kills = pd.DataFrame(
        kill_rows, columns=["key", "origin", "kill_vid"]
    ).astype(np.int64) if kill_rows else pd.DataFrame(
        {"key": pd.Series(dtype=np.int64),
         "origin": pd.Series(dtype=np.int64),
         "kill_vid": pd.Series(dtype=np.int64)})
    return VersionedDataset(
        graph=graph, records=records, kills=kills,
        config={"n_base": n_base, "pct_update": pct_update,
                "update_type": update_type, "record_size": record_size,
                "p_d": p_d, "seed": seed},
        version_bytes=version_bytes, version_counts=version_counts)
