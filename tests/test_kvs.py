"""Tests for the simulated KVS substrate (ChunkStore + accounting)."""
import pytest
from pyspark.sql import functions as F

from repro.core.bottom_up import bottom_up_partition
from repro.core.indexes import chunk_map_df
from repro.core.span import assignment_df
from repro.kvs.store import ChunkStore, KVSStats
from repro.versioned.generator import generate
from repro.versioned.graph import random_tree
from repro.versioned.membership import membership_spark


@pytest.fixture(scope="module")
def store(spark, tmp_path_factory):
    g = random_tree(20, deepen_prob=0.85, seed=21)
    ds = generate(g, n_base=50, pct_update=15, with_payload=True, seed=10)
    rdf = ds.spark_records(spark)
    mem = membership_spark(spark, g, rdf, ds.spark_kills(spark))
    asg = bottom_up_partition(g, ds.records, ds.kills, C=500)
    adf = assignment_df(spark, asg)
    st = ChunkStore(tmp_path_factory.mktemp("kvs"), n_nodes=4)
    st.write(rdf.join(adf.select("key", "origin", "chunk"), ["key", "origin"]),
             chunk_map_df(mem, adf))
    return g, ds, asg, st


class TestWriteRead:
    def test_roundtrip_all_chunks(self, spark, store):
        g, ds, asg, st = store
        all_ids = sorted(asg["chunk"].unique().tolist())
        got = st.get_chunks(spark, all_ids)
        assert got.count() == ds.n_unique

    def test_partition_pruning_returns_subset(self, spark, store):
        g, ds, asg, st = store
        one = int(asg["chunk"].iloc[0])
        got = st.get_chunks(spark, [one]).toPandas()
        exp = asg[asg["chunk"] == one]
        assert set(zip(got.key, got.origin)) == set(zip(exp.key, exp.origin))

    def test_chunk_maps_roundtrip(self, spark, store):
        g, ds, asg, st = store
        one = int(asg["chunk"].iloc[0])
        m = st.get_chunk_maps(spark, [one]).toPandas()
        assert (m["chunk"] == one).all()
        assert len(m) > 0

    def test_chunk_bytes_match_assignment(self, store):
        g, ds, asg, st = store
        exp = asg.groupby("chunk")["size"].sum().to_dict()
        assert st.chunk_bytes() == {int(k): int(v) for k, v in exp.items()}


class TestAccounting:
    def test_request_and_byte_counters(self, spark, store):
        g, ds, asg, st = store
        st.reset_stats()
        ids = sorted(asg["chunk"].unique().tolist())[:3]
        st.get_chunks(spark, ids)
        assert st.stats.n_requests == 3
        exp_bytes = int(asg[asg["chunk"].isin(ids)]["size"].sum())
        assert st.stats.n_bytes == exp_bytes

    def test_per_node_distribution(self, spark, store):
        g, ds, asg, st = store
        st.reset_stats()
        ids = sorted(asg["chunk"].unique().tolist())
        st.get_chunks(spark, ids)
        assert sum(st.stats.per_node_requests.values()) == len(ids)
        assert set(st.stats.per_node_requests) <= set(range(4))

    def test_stats_object_standalone(self):
        s = KVSStats()
        s.record([0, 1, 5], {0: 10, 1: 20, 5: 30}, n_nodes=2)
        assert s.n_requests == 3 and s.n_bytes == 60
        assert s.per_node_requests == {0: 1, 1: 2}
