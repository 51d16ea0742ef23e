"""BOTTOM-UP partitioning (§3.2, Algorithm 3).

The version tree is processed children-before-parent (via the delta
walker, so the live set at each exit equals that version's record set).
Each version ``v`` receives from every child a π-collection mapping
*run length* → set of records, where a record with run length ``j``
appears in ``j`` consecutive versions starting at that child (counts are
summed across children for records reachable via several branches, per
§3.2's general-tree rule). At ``v``:

- records present in a child π but **absent from S_v** can never appear
  higher in the tree (membership regions are connected), so they are
  *emitted* for chunking, longest runs first — Example 4's
  red-before-green-before-blue order;
- records of ``S_v`` extend their run (+1); records of ``S_v`` seen in
  no child start a run of 1. Together these form π_v.

**Chunk layout.** The paper's rule — each chunking step fills fresh
chunks, longest-run α-sets first, partials merged at the end "to ensure
access to highly common records during version reconstruction is not
split across multiple chunks" — is realized globally: emitted records
are laid out run-class-major (geometric run buckets, longest class
first) and emission-order-minor, so records serving many consecutive
versions share chunks with each other rather than with short-lived
records that happen to be born at the same version. Within a bucket the
bottom-up emission order keeps neighbouring versions' records adjacent.
Empirically this ordering makes BOTTOM-UP uniformly best across chain,
deep-branched and shallow-branched datasets (Fig 8's claim), where a
strictly per-version layout loses to SHINGLE on skewed deep trees.

``beta`` caps the number of run-length classes per π-collection by
merging the smallest sets into their nearest longer-run neighbour —
the paper's subtree-size reduction (§3.2.1) expressed directly on the
π representation: same speed/quality trade-off, coarser run resolution.
"""
from __future__ import annotations

import math
from collections import defaultdict

import numpy as np
import pandas as pd

from ..versioned.walker import walk
from .chunking import pack_ordered

# Geometric base for run-length classes; see module docstring. Chosen by a
# sweep over the Table-2 dataset families: base 6 makes BOTTOM-UP best (or
# tied) on every family — chains, deep-branched, shallow-branched.
RUN_BUCKET_BASE = 6.0


def _bucket(run: int) -> int:
    return int(math.log(max(run, 1), RUN_BUCKET_BASE))


def bottom_up_partition(graph, records: pd.DataFrame, kills: pd.DataFrame,
                        C: int, *, beta: int | None = None,
                        start_chunk: int = 0) -> pd.DataFrame:
    """Return the assignment ``(key, origin, size, chunk)``."""
    sizes = {(int(k), int(o)): int(s)
             for k, o, s in zip(records["key"], records["origin"],
                                records["size"])}
    # π-collections awaiting consumption by the parent: v -> {run: set}.
    pi: dict[int, dict[int, set]] = {}
    emitted: list[tuple[int, int, tuple[int, int]]] = []  # (step, run, rec)
    step_counter = [0]

    def _emit(rec_counts: dict) -> None:
        # Longer runs first within the step (they serve the most
        # consecutive versions), deterministic within a run class.
        step = step_counter[0]
        step_counter[0] += 1
        for rec in sorted(rec_counts, key=lambda r: (-rec_counts[r], r)):
            emitted.append((step, rec_counts[rec], rec))

    def _cap_beta(coll: dict[int, set]) -> dict[int, set]:
        if beta is None or len(coll) <= beta:
            return coll
        # Merge the smallest set into the next-longer run class until the
        # collection fits — §3.2.1's quality-for-speed knob.
        while len(coll) > beta:
            runs = sorted(coll, key=lambda r: (len(coll[r]), r))
            victim = runs[0]
            longer = [r for r in sorted(coll) if r > victim]
            target = longer[0] if longer else sorted(coll)[-1]
            if target == victim:
                break
            coll[target] |= coll.pop(victim)
        return coll

    def _exit(v: int, live: dict) -> None:
        merged: dict[tuple[int, int], int] = defaultdict(int)
        for c in graph.children[v]:
            for run, recs in pi.pop(c).items():
                for rec in recs:
                    merged[rec] += run
        dead: dict[tuple[int, int], int] = {}
        pi_v: dict[int, set] = defaultdict(set)
        for rec, run in merged.items():
            if live.get(rec[0]) == rec[1]:
                pi_v[run + 1].add(rec)
            else:
                dead[rec] = run
        if dead:
            _emit(dead)
        # Records of S_v untouched below start a run of length 1.
        fresh = {(k, o) for k, o in live.items()} - set().union(*pi_v.values()) \
            if pi_v else {(k, o) for k, o in live.items()}
        if fresh:
            pi_v[1] |= fresh
        pi[v] = _cap_beta(dict(pi_v))

    walk(graph, records, kills, _exit)
    # Root's π: everything still alive at the root's exit.
    root_counts = {rec: run for run, recs in pi.pop(0).items() for rec in recs}
    if root_counts:
        _emit(root_counts)

    # Run-class-major, emission-order-minor layout (module docstring).
    order = sorted(range(len(emitted)),
                   key=lambda i: (-_bucket(emitted[i][1]), emitted[i][0], i))
    ordered_sizes = np.array([sizes[emitted[i][2]] for i in order],
                             dtype=np.int64)
    groups = [_bucket(emitted[i][1]) for i in order]
    ids, _ = pack_ordered(ordered_sizes, C, group_ids=groups,
                          start_chunk=start_chunk)
    out = pd.DataFrame([emitted[i][2] for i in order],
                       columns=["key", "origin"])
    out["size"] = ordered_sizes
    out["chunk"] = ids
    return out.astype({"key": "int64", "origin": "int64"})
