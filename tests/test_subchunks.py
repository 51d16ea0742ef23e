"""Tests for sub-chunk construction (§3.4, Algorithm 5, Fig 7/Example 6)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.bottom_up import bottom_up_partition
from repro.core.subchunks import (build_subchunks, compress_subchunks,
                                  sc_dataset, transformed_tree)
from repro.versioned.generator import generate
from repro.versioned.graph import chain, random_tree
from repro.versioned.membership import membership_pd

from tests.paper_examples import fig7


def sc_groups(sc_assign):
    out = {}
    for r in sc_assign.itertuples():
        out.setdefault(r.sc, set()).add((int(r.key), int(r.origin)))
    return set(frozenset(s) for s in out.values())


class TestFig7:
    """The paper's Fig 7(c) sub-chunk list with k=3, reproduced exactly."""

    def test_subchunk_groups_match_paper(self):
        g, rec, kills = fig7()
        sc = build_subchunks(g, rec, k=3)
        got = sc_groups(sc)
        want = set(map(frozenset, [
            {(0, 1), (0, 2), (0, 4)},   # SC0
            {(0, 0)},                   # SC1
            {(1, 0), (1, 1), (1, 3)},   # SC2
            {(2, 1), (2, 2), (2, 4)},   # SC3
            {(2, 0)},                   # SC4
            {(3, 2), (3, 4), (3, 5)},   # SC5
            {(3, 0), (3, 6)},           # SC6
            {(4, 3)},                   # SC7
            {(5, 5)},                   # SC8
        ]))
        assert got == want

    def test_transformed_tree_drops_v4_and_v6(self):
        # Example 6: V4 duplicates V2 and V6 duplicates V3.
        g, rec, kills = fig7()
        sc = build_subchunks(g, rec, k=3)
        reps, kept = transformed_tree(g, rec, sc)
        assert set(kept) == {0, 1, 2, 3, 5}

    def test_representative_composite_keys(self):
        g, rec, kills = fig7()
        sc = build_subchunks(g, rec, k=3)
        reps, kept = transformed_tree(g, rec, sc)
        rep_cks = set(reps.values())
        # Fig 7(c) CK column.
        assert rep_cks == {(0, 1), (0, 0), (1, 0), (2, 1), (2, 0), (3, 2),
                           (3, 0), (4, 3), (5, 5)}


class TestInvariants:
    @pytest.fixture(scope="class")
    def gen(self):
        g = random_tree(40, deepen_prob=0.9, seed=6)
        ds = generate(g, n_base=100, pct_update=15, p_d=0.05,
                      with_payload=True, seed=3)
        return g, ds

    @pytest.mark.parametrize("k", [1, 2, 5, 10])
    def test_every_record_in_exactly_one_subchunk(self, gen, k):
        g, ds = gen
        sc = build_subchunks(g, ds.records, k=k)
        assert len(sc) == ds.n_unique
        assert not sc.duplicated(["key", "origin"]).any()

    @pytest.mark.parametrize("k", [1, 2, 5, 10])
    def test_subchunk_size_bounded_by_k(self, gen, k):
        g, ds = gen
        sc = build_subchunks(g, ds.records, k=k)
        assert sc.groupby("sc").size().max() <= k

    def test_single_key_per_subchunk(self, gen):
        g, ds = gen
        sc = build_subchunks(g, ds.records, k=5)
        assert (sc.groupby("sc")["key"].nunique() == 1).all()

    def test_k1_is_identity(self, gen):
        g, ds = gen
        sc = build_subchunks(g, ds.records, k=1)
        assert sc["sc"].nunique() == ds.n_unique

    def test_invalid_k(self, gen):
        g, ds = gen
        with pytest.raises(ValueError):
            build_subchunks(g, ds.records, k=0)


class TestCompression:
    @pytest.fixture(scope="class")
    def gen(self):
        g = chain(30)
        ds = generate(g, n_base=60, pct_update=20, record_size=400,
                      p_d=0.02, with_payload=True, seed=4)
        return g, ds

    def test_compression_improves_with_k(self, gen):
        g, ds = gen
        ratios = {}
        for k in (1, 5, 20):
            sc = build_subchunks(g, ds.records, k=k)
            cs = compress_subchunks(ds.records, sc, g.depths())
            ratios[k] = cs.raw_bytes.sum() / cs.comp_bytes.sum()
        assert ratios[5] > ratios[1]
        assert ratios[20] > ratios[5]

    def test_compressed_never_bigger_than_raw(self, gen):
        g, ds = gen
        sc = build_subchunks(g, ds.records, k=10)
        cs = compress_subchunks(ds.records, sc, g.depths())
        assert (cs.comp_bytes <= cs.raw_bytes).all()

    def test_without_payload_ratio_is_one(self):
        g = chain(10)
        ds = generate(g, n_base=30, pct_update=20, with_payload=False, seed=1)
        sc = build_subchunks(g, ds.records, k=5)
        cs = compress_subchunks(ds.records, sc, g.depths())
        assert (cs.comp_bytes == cs.raw_bytes).all()


class TestScDataset:
    @pytest.fixture(scope="class")
    def built(self):
        g = random_tree(35, deepen_prob=0.9, seed=7)
        ds = generate(g, n_base=80, pct_update=15, p_d=0.05,
                      with_payload=True, seed=5)
        mem = membership_pd(g, ds.records, ds.kills)
        sc = build_subchunks(g, ds.records, k=4)
        cs = compress_subchunks(ds.records, sc, g.depths())
        return g, ds, mem, sc, cs

    def test_region_equals_member_membership_union(self, built):
        g, ds, mem, sc, cs = built
        _, _, region = sc_dataset(g, mem, sc, cs)
        exact = (mem.merge(sc, on=["key", "origin"])[["vid", "sc"]]
                 .drop_duplicates())
        assert len(region) == len(exact)
        assert (set(map(tuple, region.to_numpy().tolist()))
                == set(map(tuple, exact.to_numpy().tolist())))

    def test_phase2_inputs_consistent_for_walker(self, built):
        g, ds, mem, sc, cs = built
        screc, sckill, _ = sc_dataset(g, mem, sc, cs)
        # bottom_up runs the walker internally; must not raise.
        asg = bottom_up_partition(g, screc, sckill, C=2000)
        assert len(asg) == len(screc)

    def test_representative_is_shallowest_member(self, built):
        g, ds, mem, sc, cs = built
        screc, _, _ = sc_dataset(g, mem, sc, cs)
        depths = g.depths()
        joined = sc.merge(screc.rename(
            columns={"key": "sc", "origin": "rep"}), on="sc")
        assert (depths[joined["rep"].to_numpy()]
                <= depths[joined["origin"].to_numpy()]).all()

    def test_sizes_are_compressed_bytes(self, built):
        g, ds, mem, sc, cs = built
        screc, _, _ = sc_dataset(g, mem, sc, cs)
        assert screc["size"].sum() == cs["comp_bytes"].sum()
