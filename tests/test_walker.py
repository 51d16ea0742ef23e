"""Tests for the delta-replay walker (live sets with undo)."""
import pandas as pd
import pytest

from repro.versioned.graph import VersionGraph, chain
from repro.versioned.walker import deltas_by_version, live_sets, walk

from tests.paper_examples import df_kills, df_records, example2


class TestLiveSets:
    def test_example2_contents(self):
        g, rec, kills, expected = example2()
        live = live_sets(g, rec, kills)
        for vid, want in expected.items():
            got = {(k, o) for k, o in live[vid].items()}
            assert got == want, f"version {vid}"

    def test_sibling_isolation(self):
        # V2's delete of K2 must not leak into V1's branch (undo check).
        g, rec, kills, expected = example2()
        live = live_sets(g, rec, kills)
        assert 2 in live[1] and 2 not in live[2]

    def test_chain_growth(self):
        g = chain(3)
        rec = df_records([(0, 0), (1, 1), (2, 2)])
        live = live_sets(g, rec, df_kills([]))
        assert len(live[0]) == 1 and len(live[1]) == 2 and len(live[2]) == 3


class TestWalkCallbacks:
    def test_exit_order_is_postorder(self):
        g, rec, kills, _ = example2()
        seen = []
        walk(g, rec, kills, lambda v, live: seen.append(v))
        assert seen == g.postorder()

    def test_enter_callback_sees_applied_delta(self):
        g, rec, kills, expected = example2()
        entered = {}
        walk(g, rec, kills, lambda v, live: None,
             on_enter=lambda v, live: entered.update({v: set(live.items())}))
        assert {k for k, _ in entered[1]} == {0, 1, 2, 3, 4}


class TestConsistencyChecks:
    def test_kill_of_wrong_origin_raises(self):
        g = chain(2)
        rec = df_records([(0, 0)])
        kills = df_kills([(0, 5, 1)])  # live origin is 0, not 5
        with pytest.raises(ValueError, match="inconsistent"):
            walk(g, rec, kills, lambda v, live: None)

    def test_add_over_live_record_raises(self):
        g = chain(2)
        rec = df_records([(0, 0), (0, 1)])  # re-add without kill
        with pytest.raises(ValueError, match="inconsistent"):
            walk(g, rec, df_kills([]), lambda v, live: None)


class TestDeltasByVersion:
    def test_split(self):
        g, rec, kills, _ = example2()
        adds, kls = deltas_by_version(g.n, rec, kills)
        assert [k for k, _ in adds[0]] == [0, 1, 2, 3]
        assert [k for k, _ in adds[1]] == [3, 4]
        assert kls[2] == [(3, 0), (2, 0)]
        assert kls[3] == [(2, 0)]
