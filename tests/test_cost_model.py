"""Tests for the Table 1 analytical formulas and the KVS cost model."""
import pytest

from repro.core.cost_model import Table1Params, table1_rows
from repro.kvs.cost import SEC23_MODEL, CostModel


@pytest.fixture
def params():
    # A configuration mirroring the §2.3 experiment: 100-byte records,
    # 100K records/version, 1 MB chunks.
    return Table1Params(n=100, m_v=100_000, d=0.1, c=0.2, s=100, s_c=1 << 20)


class TestTable1:
    def test_row_names(self, params):
        rows = table1_rows(params)
        assert [r["algorithm"] for r in rows] == [
            "Independent w/chunking", "DELTA", "SubChunk",
            "Single-address space"]

    def test_independent_chunking_values(self, params):
        r = table1_rows(params)[0]
        assert r["storage"] == 100 * 100_000 * 100
        assert r["version_queries"] == pytest.approx(
            100_000 * 100 / (1 << 20))
        assert r["point_queries"] == 1

    def test_delta_point_query_is_catastrophic(self, params):
        rows = {r["algorithm"]: r for r in table1_rows(params)}
        assert rows["DELTA"]["point_data"] > 1000 * rows[
            "Single-address space"]["point_data"]
        assert rows["DELTA"]["point_queries"] == params.n / 2

    def test_compressed_layouts_store_less(self, params):
        rows = {r["algorithm"]: r for r in table1_rows(params)}
        assert rows["DELTA"]["storage"] < rows["Single-address space"]["storage"]
        assert rows["SubChunk"]["storage"] == rows["DELTA"]["storage"]
        assert rows["Independent w/chunking"]["storage"] > rows[
            "Single-address space"]["storage"]

    def test_chunking_minimizes_version_queries(self, params):
        rows = {r["algorithm"]: r for r in table1_rows(params)}
        chunked = rows["Independent w/chunking"]["version_queries"]
        assert chunked < rows["SubChunk"]["version_queries"]
        assert chunked < rows["Single-address space"]["version_queries"]


class TestCostModel:
    def test_latency_dominates_many_small_requests(self):
        m = CostModel(request_latency_s=1e-3, bandwidth_bps=1e9,
                      process_s_per_chunk=0.0)
        t = m.retrieval_time(100_000, 10_000_000)
        assert t == pytest.approx(100 + 0.01)

    def test_concurrency_divides_latency_waves(self):
        m1 = CostModel(request_latency_s=1e-3, process_s_per_chunk=0,
                       concurrency=1)
        m4 = CostModel(request_latency_s=1e-3, process_s_per_chunk=0,
                       concurrency=4)
        assert m4.retrieval_time(100, 0) == pytest.approx(
            m1.retrieval_time(100, 0) / 4)

    def test_sequential_processing_term(self):
        m = CostModel(request_latency_s=0, bandwidth_bps=1e12,
                      process_s_per_chunk=0.01)
        assert m.retrieval_time(500, 0) == pytest.approx(5.0)

    def test_sec23_calibration_reproduces_unit_chunk_row(self):
        # 100K unit-chunk requests over 10 MB ≈ 65 s (paper: 65.42 s).
        t = SEC23_MODEL.retrieval_time(100_000, 10_000_000)
        assert 55 < t < 75

    def test_zero_requests(self):
        assert CostModel().retrieval_time(0, 0) == 0.0
