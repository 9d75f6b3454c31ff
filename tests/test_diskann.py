"""Tests for the Vamana/FreshDiskANN baseline (paper §5.1)."""
import numpy as np
import pytest

from repro.baselines.diskann import FreshDiskANN, SearchCost, VamanaGraph
from repro.synth_data import clustered_vectors, ground_truth_knn


def build_graph(n=400, dim=8, seed=0, **kw) -> tuple[VamanaGraph, np.ndarray]:
    vecs = clustered_vectors(n=n, dim=dim, n_clusters=8, seed=seed)
    g = VamanaGraph(dim, **kw)
    for i in range(n):
        g.insert(i, vecs[i])
    return g, vecs


class TestVamana:
    def test_insert_and_len(self):
        g, _ = build_graph(50)
        assert len(g) == 50

    def test_degree_bounded_by_R(self):
        # backlinks may exceed R by the 30% prune slack, never more
        g, _ = build_graph(300, R=16)
        assert max(len(n) for n in g._nbrs) <= int(16 * 1.3) + 1

    def test_search_recall(self):
        g, vecs = build_graph(400, R=24)
        qs = clustered_vectors(n=30, dim=8, n_clusters=8, seed=5)
        gt = ground_truth_knn(vecs, qs, 10)
        hits = 0
        for i, q in enumerate(qs):
            ids = g.search_vids(q, 10, L=48)
            hits += len(np.intersect1d(ids, gt[i]))
        assert hits / 300 >= 0.85

    def test_search_cost_counters(self):
        g, vecs = build_graph(200)
        cost = SearchCost()
        g.greedy_search(vecs[0], 5, 32, cost)
        assert cost.hops > 0 and cost.dist_comps >= cost.hops

    def test_delete_excludes_from_results(self):
        g, vecs = build_graph(100)
        assert 7 in g.search_vids(vecs[7], 3, L=32)
        g.delete(7)
        assert 7 not in g.search_vids(vecs[7], 3, L=32)

    def test_consolidate_deletes_repairs_and_unlinks(self):
        g, vecs = build_graph(200)
        for vid in range(0, 50):
            g.delete(vid)
        repaired = g.consolidate_deletes()
        assert repaired > 0
        live = set(g.live_positions)
        for p in live:
            assert all(n in live for n in g._nbrs[p])

    def test_recall_survives_consolidation(self):
        g, vecs = build_graph(400, R=24)
        rng = np.random.default_rng(1)
        dead = rng.choice(400, 100, replace=False)
        for vid in dead:
            g.delete(int(vid))
        g.consolidate_deletes()
        live_mask = np.ones(400, dtype=bool)
        live_mask[dead] = False
        live_vecs = vecs[live_mask]
        live_vids = np.flatnonzero(live_mask)
        qs = clustered_vectors(n=20, dim=8, n_clusters=8, seed=6)
        gt = live_vids[ground_truth_knn(live_vecs, qs, 10)]
        hits = sum(
            len(np.intersect1d(g.search_vids(q, 10, L=48), gt[i])) for i, q in enumerate(qs)
        )
        assert hits / 200 >= 0.7  # degraded but functional, as in the paper

    def test_memory_model(self):
        g, _ = build_graph(100)
        assert g.memory_bytes() > 0


class TestFreshDiskANN:
    @pytest.fixture()
    def fresh(self) -> tuple[FreshDiskANN, np.ndarray]:
        vecs = clustered_vectors(n=300, dim=8, n_clusters=8, seed=0)
        return FreshDiskANN.build(vecs, np.arange(300), R=24, merge_every=100), vecs

    def test_insert_goes_to_delta(self, fresh):
        idx, _ = fresh
        new = clustered_vectors(n=1, dim=8, n_clusters=8, seed=9)[0]
        idx.insert(999, new)
        assert idx.delta.contains(999) and not idx.main.contains(999)

    def test_new_vector_found_before_merge(self, fresh):
        idx, _ = fresh
        new = clustered_vectors(n=1, dim=8, n_clusters=8, seed=10)[0]
        idx.insert(999, new)
        ids, _, _ = idx.search(new, 5)
        assert 999 in ids

    def test_deleted_vector_filtered(self, fresh):
        idx, vecs = fresh
        ids, _, _ = idx.search(vecs[3], 3)
        assert 3 in ids
        idx.delete(3)
        ids, _, _ = idx.search(vecs[3], 3)
        assert 3 not in ids

    def test_merge_trigger_threshold(self, fresh):
        idx, _ = fresh
        assert not idx.needs_merge()
        for i in range(100):
            idx.delete(i)
        assert idx.needs_merge()

    def test_streaming_merge_folds_delta(self, fresh):
        idx, _ = fresh
        new = clustered_vectors(n=50, dim=8, n_clusters=8, seed=11)
        for i, v in enumerate(new):
            idx.insert(1000 + i, v)
        for i in range(50):
            idx.delete(i)
        idx.streaming_merge()
        assert idx.stats.merges == 1
        assert len(idx.delta._vids) == 0 and not idx.tombstones
        assert idx.main.contains(1000) and not idx.main.contains(0)

    def test_search_correct_after_merge(self, fresh):
        idx, vecs = fresh
        new = clustered_vectors(n=30, dim=8, n_clusters=8, seed=12)
        for i, v in enumerate(new):
            idx.insert(1000 + i, v)
        idx.streaming_merge()
        ids, _, _ = idx.search(new[0], 5)
        assert 1000 in ids

    def test_delete_of_delta_resident_vector(self, fresh):
        idx, _ = fresh
        v = clustered_vectors(n=1, dim=8, n_clusters=8, seed=13)[0]
        idx.insert(777, v)
        idx.delete(777)
        ids, _, _ = idx.search(v, 5)
        assert 777 not in ids
        idx.streaming_merge()
        assert not idx.main.contains(777)

    def test_memory_includes_delta(self, fresh):
        idx, _ = fresh
        m0 = idx.memory_bytes()
        for i, v in enumerate(clustered_vectors(n=40, dim=8, n_clusters=8, seed=14)):
            idx.insert(2000 + i, v)
        assert idx.memory_bytes() > m0

    def test_search_returns_separate_costs(self, fresh):
        idx, vecs = fresh
        _, main_cost, delta_cost = idx.search(vecs[0], 5)
        assert main_cost.hops > 0
        assert delta_cost.hops == 0  # empty delta
