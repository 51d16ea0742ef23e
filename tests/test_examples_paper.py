"""Fidelity tests: the paper's worked examples reproduce exactly."""
import pandas as pd
import pytest

from repro.core.span import total_version_span_pd, version_spans_pd
from repro.versioned.membership import membership_pd

from tests.paper_examples import example2, example3_partitions


class TestExample2:
    """Fig 1's version-to-record mapping."""

    def test_membership_matches_paper(self):
        g, rec, kills, expected = example2()
        mem = membership_pd(g, rec, kills)
        for vid, want in expected.items():
            got = set(zip(mem[mem.vid == vid].key, mem[mem.vid == vid].origin))
            assert got == want, f"V{vid}"

    def test_record_retrieval_k3_v3_resolves_to_v1(self):
        # "To retrieve K3 from version V3 ... we need <K3,V1>".
        g, rec, kills, _ = example2()
        mem = membership_pd(g, rec, kills)
        row = mem[(mem.vid == 3) & (mem.key == 3)]
        assert row["origin"].tolist() == [1]

    def test_delta_0_1_contents(self):
        # Δ0,1 = {+<K3,V1>, +<K4,V1>, −<K3,V0>}
        g, rec, kills, _ = example2()
        adds = set(zip(rec[rec.origin == 1].key, rec[rec.origin == 1].origin))
        dels = set(zip(kills[kills.kill_vid == 1].key,
                       kills[kills.kill_vid == 1].origin))
        assert adds == {(3, 1), (4, 1)}
        assert dels == {(3, 0)}


class TestExample3:
    """The two partitionings P0/P1 and their span difference."""

    def test_v1_spans(self):
        g, rec, kills, _ = example2()
        mem = membership_pd(g, rec, kills)
        p0, p1 = example3_partitions()
        s0 = version_spans_pd(mem, p0)
        s1 = version_spans_pd(mem, p1)
        # "To reconstruct V1 we must retrieve chunks C0,C1,C2,C3 for P0,
        #  and chunks C0,C1,C2 for P1."
        assert s0[1] == 4
        assert s1[1] == 3

    def test_average_span_reduction_is_0_6(self):
        g, rec, kills, _ = example2()
        mem = membership_pd(g, rec, kills)
        p0, p1 = example3_partitions()
        t0 = total_version_span_pd(mem, p0)
        t1 = total_version_span_pd(mem, p1)
        assert (t0 - t1) / g.n == pytest.approx(0.6)
