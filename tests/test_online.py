"""Tests for online partitioning (§4, Fig 13)."""
import pandas as pd
import pytest

from repro.core.bottom_up import bottom_up_partition
from repro.core.online import (online_partition, partition_batch,
                               quality_ratio, _batch_graph)
from repro.core.span import total_version_span_pd
from repro.versioned.generator import generate
from repro.versioned.graph import chain, random_tree
from repro.versioned.membership import membership_pd


@pytest.fixture(scope="module")
def gen():
    g = random_tree(60, deepen_prob=0.9, seed=4)
    ds = generate(g, n_base=120, pct_update=10, seed=6)
    mem = membership_pd(g, ds.records, ds.kills)
    return g, ds, mem


class TestBatchGraph:
    def test_forest_wrapping(self, gen):
        g, ds, mem = gen
        bg, to_orig = _batch_graph(g, 20, 40)
        assert bg.n == 21
        assert sorted(to_orig.values()) == list(range(20, 40))
        # Every batch version whose parent is outside maps under the root.
        for b in range(1, bg.n):
            v = to_orig[b]
            p = g.parent[v]
            assert bg.parent[b] == 0 if (p is None or p < 20) else True


class TestOnlinePartition:
    def test_all_records_assigned_once(self, gen):
        g, ds, mem = gen
        asg, _ = online_partition(g, ds.records, ds.kills, C=600,
                                  batch_size=15)
        assert len(asg) == ds.n_unique
        assert not asg.duplicated(["key", "origin"]).any()

    def test_chunk_ids_disjoint_across_batches(self, gen):
        g, ds, mem = gen
        b1 = partition_batch(g, ds.records, ds.kills, 0, 30, 600, 0)
        b2 = partition_batch(g, ds.records, ds.kills, 30, 60, 600,
                             int(b1["chunk"].max()) + 1)
        assert set(b1["chunk"]).isdisjoint(set(b2["chunk"]))

    def test_snapshots_cover_prefix(self, gen):
        g, ds, mem = gen
        _, snaps = online_partition(g, ds.records, ds.kills, C=600,
                                    batch_size=15, checkpoints=[30, 60])
        got = snaps[30]
        exp = ds.records[ds.records["origin"] < 30]
        assert len(got) == len(exp)

    def test_empty_batch_ok(self):
        g = chain(6)
        ds = generate(g, n_base=10, pct_update=10, seed=1)
        # Remove records of versions 2,3 to force an empty batch.
        rec = ds.records[~ds.records["origin"].isin([2, 3])]
        kills = ds.kills[~ds.kills["origin"].isin([2, 3])
                         & ~ds.kills["kill_vid"].isin([2, 3])]
        asg, _ = online_partition(g, rec, kills, C=100, batch_size=2)
        assert len(asg) == len(rec)


class TestQuality:
    def test_ratio_at_least_one_ish(self, gen):
        g, ds, mem = gen
        ratios = quality_ratio(g, ds.records, ds.kills, mem, C=600,
                               batch_size=15, checkpoints=[30, 60])
        for t, r in ratios.items():
            assert r >= 0.9, (t, r)

    def test_larger_batches_do_not_hurt(self, gen):
        # Fig 13: partitioning quality improves with batch size.
        g, ds, mem = gen
        small = quality_ratio(g, ds.records, ds.kills, mem, C=600,
                              batch_size=10, checkpoints=[60])[60]
        large = quality_ratio(g, ds.records, ds.kills, mem, C=600,
                              batch_size=30, checkpoints=[60])[60]
        assert large <= small * 1.1

    def test_full_batch_matches_offline(self, gen):
        # batch_size = n reduces to the offline algorithm (ratio == 1).
        g, ds, mem = gen
        ratios = quality_ratio(g, ds.records, ds.kills, mem, C=600,
                               batch_size=g.n, checkpoints=[g.n])
        assert ratios[g.n] == pytest.approx(1.0)

    def test_non_boundary_checkpoints_skipped(self, gen):
        g, ds, mem = gen
        ratios = quality_ratio(g, ds.records, ds.kills, mem, C=600,
                               batch_size=25, checkpoints=[30])
        assert 30 not in ratios
