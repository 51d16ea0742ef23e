"""Table 1's analytical storage/retrieval cost formulas.

Assumptions (§2.2): ``n`` versions in a chain, ``m_v`` records per
version, every derivation updates a fraction ``d`` of records, record
size ``s``, chunk size ``s_c``, compression ratio ``c`` (c, d ≪ 1).
Each entry is (amount of data retrieved, number of queries) for a random
full-version query and a point (single record) query, plus total storage.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class Table1Params:
    n: int        # number of versions (chain)
    m_v: int      # records per version
    d: float      # fraction updated per version
    c: float      # compression ratio
    s: float      # record size (bytes)
    s_c: float    # chunk size (bytes)


def table1_rows(p: Table1Params) -> list[dict]:
    """The four rows of Table 1, evaluated numerically."""
    n, m_v, d, c, s, s_c = p.n, p.m_v, p.d, p.c, p.s, p.s_c
    return [
        {
            "algorithm": "Independent w/chunking",
            "storage": n * m_v * s,
            "version_data": m_v * s,
            "version_queries": m_v * s / s_c,
            "point_data": s_c,
            "point_queries": 1,
        },
        {
            "algorithm": "DELTA",
            "storage": m_v * s + c * d * (n - 1) * m_v * s,
            "version_data": m_v * s + c * d * (n - 1) * m_v * s / 2,
            "version_queries": n / 2,
            "point_data": m_v * s + c * d * (n - 1) * m_v * s / 2,
            "point_queries": n / 2,
        },
        {
            "algorithm": "SubChunk",
            "storage": m_v * s + c * d * (n - 1) * m_v * s,
            "version_data": m_v * (s + c * d * (n - 1) * s),
            "version_queries": m_v,
            "point_data": s + c * d * (n - 1) * s,
            "point_queries": 1,
        },
        {
            "algorithm": "Single-address space",
            "storage": m_v * s + d * (n - 1) * m_v * s,
            "version_data": m_v * s,
            "version_queries": m_v,
            "point_data": s,
            "point_queries": 1,
        },
    ]
