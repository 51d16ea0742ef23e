"""Delta replay over a version tree with O(total-delta) undo.

The generator, the brute-force membership computation, and the BOTTOM-UP
partitioner all need the *live set* of each version (primary key → origin
version of the live record). Materializing one set per version is
O(n · m'); instead we DFS the tree applying each version's delta on entry
and undoing it on exit, so the cost is proportional to total delta size.

``on_exit(v, live)`` fires when every child of ``v`` has been processed
and ``live`` again equals ``S_v`` — the state the BOTTOM-UP recursion
needs (DESIGN §6).
"""
from __future__ import annotations

from typing import Callable

import pandas as pd


def deltas_by_version(graph_n: int, records: pd.DataFrame, kills: pd.DataFrame):
    """Split the records/kills tables into per-version add / kill lists.

    Returns ``(adds, kls)`` where ``adds[v]`` is a list of ``(key, size)``
    for records originating at ``v`` and ``kls[v]`` a list of
    ``(key, origin)`` records killed at ``v``.
    """
    adds: list[list] = [[] for _ in range(graph_n)]
    for key, origin, size in zip(records["key"].to_numpy(),
                                 records["origin"].to_numpy(),
                                 records["size"].to_numpy()):
        adds[origin].append((int(key), int(size)))
    kls: list[list] = [[] for _ in range(graph_n)]
    for key, origin, kv in zip(kills["key"].to_numpy(),
                               kills["origin"].to_numpy(),
                               kills["kill_vid"].to_numpy()):
        kls[kv].append((int(key), int(origin)))
    return adds, kls


def walk(graph, records: pd.DataFrame, kills: pd.DataFrame,
         on_exit: Callable[[int, dict], None],
         on_enter: Callable[[int, dict], None] | None = None) -> None:
    """DFS the version tree replaying deltas; see module docstring.

    ``live`` maps primary key → origin of the record live at the current
    version. Callbacks must not mutate ``live``.
    """
    adds, kls = deltas_by_version(graph.n, records, kills)
    live: dict[int, int] = {}
    # Stack of (version, phase); phase 0 = enter, 1 = exit. An undo log per
    # entered version restores `live` when we leave its subtree.
    undo: dict[int, list] = {}
    stack: list[tuple[int, int]] = [(0, 0)]
    while stack:
        v, phase = stack.pop()
        if phase == 0:
            log = []
            for key, origin in kls[v]:
                prev = live.pop(key, None)
                if prev != origin:
                    raise ValueError(
                        f"inconsistent delta: kill ({key},{origin}) at {v} "
                        f"but live origin is {prev}")
                log.append((key, origin))
            for key, _size in adds[v]:
                if key in live:
                    raise ValueError(
                        f"inconsistent delta: add key {key} at {v} over a "
                        "live record (must kill first)")
                live[key] = v
                log.append((key, None))
            undo[v] = log
            if on_enter is not None:
                on_enter(v, live)
            stack.append((v, 1))
            for c in reversed(graph.children[v]):
                stack.append((c, 0))
        else:
            on_exit(v, live)
            for key, origin in reversed(undo.pop(v)):
                if origin is None:
                    del live[key]
                else:
                    live[key] = origin


def live_sets(graph, records: pd.DataFrame, kills: pd.DataFrame) -> list[dict]:
    """Materialized live map per version — tests and small inputs only."""
    out: list[dict] = [None] * graph.n  # type: ignore[list-item]

    def _exit(v: int, live: dict) -> None:
        out[v] = dict(live)

    walk(graph, records, kills, _exit)
    return out
