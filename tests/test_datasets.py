"""Tests for the scaled Table-2 dataset specs."""
import pytest

from repro.versioned.datasets import CORE_NAMES, SPECS, TEST_SCALE, make


class TestSpecs:
    def test_all_paper_datasets_covered(self):
        assert {s.paper_name for s in SPECS.values()} == {
            "A0", "A1", "A2", "B0", "B1", "B2", "C0", "C1", "C2",
            "D0", "D1", "D2", "E", "F"}

    def test_core_names_exist(self):
        assert set(CORE_NAMES) <= set(SPECS)

    def test_chain_specs_are_chains(self):
        for name in ("A0s", "A1s", "A2s"):
            g = SPECS[name].graph(TEST_SCALE)
            assert all(len(c) <= 1 for c in g.children)


class TestGeneration:
    @pytest.mark.parametrize("name", ["A0s", "B0s", "C0s", "Fs"])
    def test_generates_at_test_scale(self, name):
        ds = make(name, scale=TEST_SCALE)
        assert ds.n_unique > 0
        assert ds.config["name"] == name
        assert ds.graph.n == max(3, int(SPECS[name].n_versions * TEST_SCALE))

    def test_update_pct_orders_unique_records(self):
        # A0s (50% updates) must create far more distinct records than
        # A2s (5%) — Table 2's #unique-records column ordering.
        a0 = make("A0s", scale=TEST_SCALE)
        a2 = make("A2s", scale=TEST_SCALE)
        assert a0.n_unique > 2 * a2.n_unique

    def test_b_trees_deeper_than_d_trees(self):
        b = SPECS["B0s"].graph(1.0)
        d = SPECS["D0s"].graph(1.0)
        assert (b.avg_leaf_depth() / b.n) > (d.avg_leaf_depth() / d.n)

    def test_payload_opt_in(self):
        ds = make("C1s", scale=TEST_SCALE, with_payload=True, p_d=0.05)
        assert ds.records["payload"].notna().all()
