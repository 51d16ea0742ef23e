"""Fig 11 (as tables): query-processing performance for Q1 (full
version), Q2 (partial version) and Q3 (record evolution), per algorithm
and max sub-chunk size k, plus the SUBCHUNK and DELTA baselines.

Times are charged by the calibrated QUERY cost model over the *exact*
spans/bytes of each layout (requests + bytes + sequential per-chunk
processing — the dominant terms in the paper's measurements; DESIGN §2).
Queries are drawn from a seeded random workload. DELTA appears only at
k=1 (no cross-version record compression); its Q3 must reconstruct every
version, which is why the paper calls it impractical.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.baselines import delta_partition, delta_version_spans
from ..core.bottom_up import bottom_up_partition
from ..core.shingle import shingle_partition
from ..core.span import total_version_span_pd
from ..core.subchunks import build_subchunks, compress_subchunks, sc_dataset
from ..core.traversal import dfs_partition
from ..kvs.cost import QUERY_MODEL, CostModel
from ..versioned.datasets import make
from ..versioned.membership import membership_pd

K_VALUES = (1, 5, 20, 50)
N_QUERIES = 20


def _query_times(mem_p, rec_assign, chunk_bytes, *, rng,
                 model: CostModel) -> dict:
    """Average simulated Q1/Q2/Q3 times over a random workload."""
    joined = mem_p.merge(rec_assign, on=["key", "origin"])
    vids = rng.choice(joined["vid"].unique(), N_QUERIES)
    keys = rng.choice(joined["key"].unique(), N_QUERIES)
    q1, q2, q3 = [], [], []
    by_vid = joined.groupby("vid")
    key_chunks = rec_assign.merge(
        chunk_bytes.rename("cb"), left_on="chunk", right_index=True)
    by_key = key_chunks.groupby("key")
    for v in vids:
        grp = by_vid.get_group(v)
        chunks = grp["chunk"].unique()
        nbytes = int(chunk_bytes.loc[chunks].sum())
        q1.append(model.retrieval_time(len(chunks), nbytes))
        # Q2: a random 10%-of-keyspace range of this version.
        lo = rng.integers(0, max(1, int(grp["key"].max())))
        hi = lo + max(1, int(0.1 * grp["key"].max()))
        sub = grp[grp["key"].between(lo, hi)]["chunk"].unique()
        nbytes2 = int(chunk_bytes.loc[sub].sum())
        q2.append(model.retrieval_time(len(sub), nbytes2))
    for k in keys:
        grp = by_key.get_group(k)
        chunks = grp["chunk"].unique()
        nbytes = int(chunk_bytes.loc[chunks].sum())
        q3.append(model.retrieval_time(len(chunks), nbytes))
    return {"q1_s": float(np.mean(q1)), "q2_s": float(np.mean(q2)),
            "q3_s": float(np.mean(q3))}


def run_dataset(spark: SparkSession | None, name: str, *,
                scale: float = 1.0, C: int = 10_000, k_values=K_VALUES,
                model: CostModel = QUERY_MODEL, seed: int = 0) -> pd.DataFrame:
    rows = []
    ds = make(name, scale=scale, with_payload=True, p_d=0.05)
    g = ds.graph
    mem_p = membership_pd(g, ds.records, ds.kills)
    rng = np.random.default_rng(seed)

    for k in k_values:
        sc = build_subchunks(g, ds.records, k=k)
        cs = compress_subchunks(ds.records, sc, g.depths())
        screc, sckill, screg = sc_dataset(g, mem_p, sc, cs)
        algos = {
            "BOTTOMUP": bottom_up_partition(g, screc, sckill, C),
            "DEPTHFIRST": dfs_partition(g, screc, C),
        }
        if spark is not None:
            reg = screg.merge(screc.rename(columns={"key": "sc"})[
                ["sc", "size"]], on="sc").rename(columns={"sc": "key"})
            reg["origin"] = 0
            mem_sc = spark.createDataFrame(reg[["vid", "key", "origin", "size"]])
            algos["SHINGLE"] = (shingle_partition(mem_sc, C)
                                .select("key", "origin", "size", "chunk")
                                .toPandas())
        for algo, asg in algos.items():
            rec_assign = sc.merge(
                asg.rename(columns={"key": "sc"})[["sc", "chunk"]], on="sc")
            chunk_bytes = asg.groupby("chunk")["size"].sum()
            t = _query_times(mem_p, rec_assign, chunk_bytes, rng=rng,
                             model=model)
            rows.append({"dataset": name, "k": k, "algorithm": algo, **t})

    # DELTA (k=1 only): Q1 walks the root path; Q2 == Q1 + filter; Q3
    # reconstructs all versions (impractical).
    d_asg = delta_partition(g, ds.records, C)
    spans = delta_version_spans(g, d_asg)
    delta_bytes = d_asg.groupby("origin")["size"].sum().reindex(
        range(g.n), fill_value=0)
    path_bytes = {}
    for v in range(g.n):
        p = g.parent[v]
        path_bytes[v] = int(delta_bytes.loc[v]) + (path_bytes[p] if p is not None else 0)
    vids = rng.choice(g.n, N_QUERIES)
    q1 = [model.retrieval_time(int(spans.loc[v]), path_bytes[v]) for v in vids]
    total_chunks = int(d_asg["chunk"].nunique())
    total_bytes = int(d_asg["size"].sum())
    q3 = model.retrieval_time(total_chunks, total_bytes)
    rows.append({"dataset": name, "k": 1, "algorithm": "DELTA",
                 "q1_s": float(np.mean(q1)), "q2_s": float(np.mean(q1)),
                 "q3_s": q3})

    # SUBCHUNK baseline: one (compressed) group per key. Q2 fetches only
    # the groups of keys inside the requested 10% range.
    key_bytes = compress_subchunks(
        ds.records, ds.records[["key", "origin"]].assign(
            sc=ds.records["key"]), g.depths()).set_index("sc")["comp_bytes"]
    v_keys = mem_p.groupby("vid")["key"].unique()
    q1, q2 = [], []
    for v in vids:
        ks = v_keys.loc[v]
        q1.append(model.retrieval_time(len(ks), int(key_bytes.loc[ks].sum())))
        lo = rng.integers(0, max(1, int(ks.max())))
        hi = lo + max(1, int(0.1 * ks.max()))
        sub = ks[(ks >= lo) & (ks <= hi)]
        q2.append(model.retrieval_time(
            len(sub), int(key_bytes.loc[sub].sum())))
    q3 = [model.retrieval_time(1, int(key_bytes.loc[k])) for k in
          rng.choice(ds.records["key"].unique(), N_QUERIES)]
    rows.append({"dataset": name, "k": "all", "algorithm": "SUBCHUNK",
                 "q1_s": float(np.mean(q1)), "q2_s": float(np.mean(q2)),
                 "q3_s": float(np.mean(q3))})
    return pd.DataFrame(rows)
