"""Tests for DFS/BFS partitioning (§3.3, Example 5 / Fig 6)."""
import pandas as pd
import pytest

from repro.core.baselines import random_partition
from repro.core.span import total_version_span_pd, version_spans_pd
from repro.core.traversal import bfs_partition, dfs_partition
from repro.versioned.generator import generate
from repro.versioned.graph import chain, random_tree
from repro.versioned.membership import membership_pd

from tests.paper_examples import df_kills, example5


class TestExample5:
    """Fig 6 with 4-record chunks: DFS puts V1's and V3's records in the
    same chunk (descendants can reuse it); BFS pairs V1 with V2."""

    def test_dfs_groups_v1_with_v3(self):
        g, rec, _ = example5()
        asg = dfs_partition(g, rec, C=4)
        chunk_of = dict(zip(zip(asg.key, asg.origin), asg.chunk))
        assert chunk_of[(10, 1)] == chunk_of[(30, 3)]
        assert chunk_of[(10, 1)] != chunk_of[(20, 2)]

    def test_bfs_groups_v1_with_v2(self):
        g, rec, _ = example5()
        asg = bfs_partition(g, rec, C=4)
        chunk_of = dict(zip(zip(asg.key, asg.origin), asg.chunk))
        assert chunk_of[(10, 1)] == chunk_of[(20, 2)]

    def test_dfs_span_beats_bfs_on_example(self):
        g, rec, kills = example5()
        mem = membership_pd(g, rec, kills)
        dfs_span = total_version_span_pd(mem, dfs_partition(g, rec, C=4))
        bfs_span = total_version_span_pd(mem, bfs_partition(g, rec, C=4))
        assert dfs_span <= bfs_span


class TestInvariants:
    def test_all_records_assigned_once(self):
        g = random_tree(30, deepen_prob=0.8, seed=2)
        ds = generate(g, n_base=60, pct_update=10, seed=1)
        for part in (dfs_partition, bfs_partition):
            asg = part(g, ds.records, C=500)
            assert len(asg) == ds.n_unique
            assert not asg.duplicated(["key", "origin"]).any()

    def test_chain_dfs_equals_bfs(self):
        g = chain(20)
        ds = generate(g, n_base=50, pct_update=10, seed=1)
        a = dfs_partition(g, ds.records, C=400)
        b = bfs_partition(g, ds.records, C=400)
        pd.testing.assert_frame_equal(
            a.sort_values(["key", "origin"]).reset_index(drop=True),
            b.sort_values(["key", "origin"]).reset_index(drop=True))

    def test_records_ordered_by_origin_rank(self):
        g = random_tree(15, deepen_prob=0.7, seed=3)
        ds = generate(g, n_base=30, pct_update=20, seed=1)
        asg = dfs_partition(g, ds.records, C=10_000_000)  # one chunk
        assert asg["chunk"].nunique() == 1


class TestQuality:
    def test_dfs_beats_random_on_branched_tree(self):
        g = random_tree(50, deepen_prob=0.9, seed=4)
        ds = generate(g, n_base=120, pct_update=15, seed=2)
        mem = membership_pd(g, ds.records, ds.kills)
        C = 800
        dfs_span = total_version_span_pd(mem, dfs_partition(g, ds.records, C))
        rnd_span = total_version_span_pd(mem, random_partition(ds.records, C))
        assert dfs_span < rnd_span

    def test_bfs_no_better_than_dfs_on_branched_tree(self):
        # §3.3 / Fig 8: BREADTHFIRST is always at least as bad as DEPTHFIRST
        # on branched trees (equal on chains).
        g = random_tree(60, deepen_prob=0.9, seed=5)
        ds = generate(g, n_base=120, pct_update=15, seed=2)
        mem = membership_pd(g, ds.records, ds.kills)
        C = 800
        dfs_span = total_version_span_pd(mem, dfs_partition(g, ds.records, C))
        bfs_span = total_version_span_pd(mem, bfs_partition(g, ds.records, C))
        assert bfs_span >= dfs_span
