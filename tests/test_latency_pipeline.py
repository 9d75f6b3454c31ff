"""Tests for the latency model and thread-scaling models (Figs. 8, 12)."""
import pytest

from repro.core.latency import LatencyModel
from repro.core.pipeline import SearchScalingModel, UpdatePipelineModel


class TestLatencyModel:
    def test_search_cost_additive(self):
        m = LatencyModel()
        lat = m.search_us(n_centroids_compared=100, vectors_scanned=500, dim=32, io_us=270.0)
        assert lat == pytest.approx(
            m.base_us + m.navigation_us(100, 32) + m.scan_us(500, 32) + 270.0
        )

    def test_more_vectors_scanned_costs_more(self):
        m = LatencyModel()
        a = m.search_us(n_centroids_compared=10, vectors_scanned=100, dim=32, io_us=0)
        b = m.search_us(n_centroids_compared=10, vectors_scanned=1000, dim=32, io_us=0)
        assert b > a

    def test_insert_has_no_scan_term(self):
        m = LatencyModel()
        assert m.insert_us(n_centroids_compared=50, dim=16, io_us=25.0) == pytest.approx(
            m.base_us + m.navigation_us(50, 16) + 25.0
        )


class TestSearchScaling:
    def make(self) -> SearchScalingModel:
        # ~1 ms CPU per query, 24 blocks/query, 400K IOPS device
        return SearchScalingModel(cpu_us_per_query=1000.0, blocks_per_query=24.0)

    def test_qps_grows_then_saturates(self):
        m = self.make()
        qps = [m.qps(t) for t in range(1, 33)]
        assert qps[1] > qps[0]
        assert qps[-1] == qps[-2]  # flat after saturation

    def test_io_bound_ceiling(self):
        m = self.make()
        assert m.qps(64) == pytest.approx(400_000 / 24.0)

    def test_iops_never_exceeds_device(self):
        m = self.make()
        for t in range(1, 33):
            assert m.iops(t) <= 400_000 + 1e-6

    def test_saturation_point_moves_with_cpu_cost(self):
        fast = SearchScalingModel(cpu_us_per_query=500.0, blocks_per_query=24.0)
        slow = SearchScalingModel(cpu_us_per_query=2000.0, blocks_per_query=24.0)
        assert fast.saturation_threads() < slow.saturation_threads()


class TestUpdatePipeline:
    def test_throughput_is_min_of_stages(self):
        m = UpdatePipelineModel(fore_us_per_update=500.0, back_us_per_update=250.0)
        assert m.qps(1, 1) == pytest.approx(1e6 / 500.0)  # fore-bound
        assert m.qps(4, 1) == pytest.approx(1e6 / 250.0)  # back-bound

    def test_two_to_one_ratio_balances(self):
        """The paper's finding: back cost ≈ half of fore cost ⇒ a 2:1
        fore:back thread ratio balances the pipeline."""
        m = UpdatePipelineModel(fore_us_per_update=500.0, back_us_per_update=250.0)
        assert m.background_keeps_up(2, 1)
        assert not m.background_keeps_up(4, 1)
        assert m.min_back_threads(8) == 4

    def test_zero_background_cost(self):
        m = UpdatePipelineModel(fore_us_per_update=500.0, back_us_per_update=0.0)
        assert m.background_keeps_up(16, 1)

    def test_scaling_monotone_in_threads(self):
        m = UpdatePipelineModel(fore_us_per_update=400.0, back_us_per_update=300.0)
        prev = 0.0
        for f in range(1, 9):
            q = m.qps(f, 8)
            assert q >= prev
            prev = q
