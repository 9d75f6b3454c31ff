"""Tests for the update-stream workload generators (paper §5.1)."""
import numpy as np
import pytest

from repro.workloads import make_workload


@pytest.fixture(scope="module")
def wl_a():
    return make_workload("spacev", n_base=1000, dim=8, n_clusters=16, n_epochs=10, n_queries=20)


@pytest.fixture(scope="module")
def wl_b():
    return make_workload("sift", n_base=1000, dim=8, n_clusters=16, n_epochs=10, n_queries=20)


class TestStructure:
    def test_epoch_count_and_rate(self, wl_a):
        assert len(wl_a.epochs) == 10
        for e in wl_a.epochs:
            assert len(e.delete_vids) == 10  # 1% of 1000
            assert len(e.insert_vids) == 10

    def test_unknown_kind_raises(self):
        with pytest.raises(ValueError):
            make_workload("bogus")

    def test_vids_unique_across_stream(self, wl_a):
        seen = set(wl_a.base_vids.tolist())
        for e in wl_a.epochs:
            ins = set(e.insert_vids.tolist())
            assert not (ins & seen)
            seen |= ins

    def test_deletes_target_live_vectors(self, wl_a):
        live = set(wl_a.base_vids.tolist())
        for e in wl_a.epochs:
            assert set(e.delete_vids.tolist()) <= live
            live -= set(e.delete_vids.tolist())
            live |= set(e.insert_vids.tolist())

    def test_live_set_size_constant(self, wl_a):
        for e in wl_a.epochs:
            wl_a.apply(e)
        assert len(wl_a.live) == 1000

    def test_deterministic(self):
        a = make_workload("sift", n_base=500, dim=8, n_epochs=3, seed=42)
        b = make_workload("sift", n_base=500, dim=8, n_epochs=3, seed=42)
        np.testing.assert_array_equal(a.base_vecs, b.base_vecs)
        np.testing.assert_array_equal(a.epochs[2].insert_vecs, b.epochs[2].insert_vecs)


class TestDistributions:
    def test_spacev_updates_shift_distribution(self):
        """Workload A's pool must differ in distribution from its base."""
        wl = make_workload("spacev", n_base=2000, dim=8, n_clusters=16, n_epochs=20, shift=0.9)
        pool = np.vstack([e.insert_vecs for e in wl.epochs])
        # mean shift across dimensions is a cheap distribution-drift probe
        drift = np.abs(pool.mean(axis=0) - wl.base_vecs.mean(axis=0)).mean()
        assert drift > 1.0

    def test_sift_updates_drift_less_than_spacev(self):
        """SIFT's pool shares the base mixture, so its drift (sampling
        noise only) must sit well below SPACEV's deliberate shift."""
        sift = make_workload("sift", n_base=2000, dim=8, n_clusters=16, n_epochs=20)
        spacev = make_workload("spacev", n_base=2000, dim=8, n_clusters=16, n_epochs=20, shift=0.9)

        def drift(wl):
            pool = np.vstack([e.insert_vecs for e in wl.epochs])
            return np.abs(pool.mean(axis=0) - wl.base_vecs.mean(axis=0)).mean()

        assert drift(sift) < drift(spacev) / 2

    def test_byte_range(self, wl_a):
        assert wl_a.base_vecs.min() >= 0 and wl_a.base_vecs.max() <= 255


class TestGroundTruth:
    def test_ground_truth_shape_and_membership(self, wl_b):
        vids, gt = wl_b.ground_truth(5)
        assert gt.shape == (20, 5)
        assert set(gt.ravel().tolist()) <= set(vids.tolist())

    def test_ground_truth_tracks_updates(self):
        wl = make_workload("sift", n_base=500, dim=8, n_epochs=5, n_queries=10)
        _, gt0 = wl.ground_truth(5)
        for e in wl.epochs:
            wl.apply(e)
        vids, gt1 = wl.ground_truth(5)
        deleted = set(wl.base_vids.tolist()) - set(vids.tolist())
        assert deleted  # some base vectors are gone
        assert not (set(gt1.ravel().tolist()) & deleted)
