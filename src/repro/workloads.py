"""Update-stream workloads (paper §5.1).

- **Workload A** — SPACEV-like: skewed cluster mass, and the update pool
  is drawn from a *shifted* mixture so the data distribution drifts over
  the run ("SPACEV: data distribution shifts over time", Fig. 7).
- **Workload B** — SIFT-like: near-uniform cluster mass, update pool from
  the *same* mixture (the paper notes SPANN+ ≈ SPFresh here).
- **Workload C** — the stress-test version of A/B at the largest scale we
  run (paper: billion-scale; here scaled per DESIGN.md §2).

Each epoch ("day") deletes ``rate`` of live vectors at random and inserts
the same count drawn from the update pool — exactly the paper's 1%-daily
protocol. Queries are drawn from the *current* mixture (base + shift
blended by elapsed epochs) so accuracy reflects freshness.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.synth_data import clustered_vectors, ground_truth_knn, mixture_centers, shifted_weights


@dataclass
class Epoch:
    """One day of updates: ids to delete, (ids, vectors) to insert."""

    delete_vids: np.ndarray
    insert_vids: np.ndarray
    insert_vecs: np.ndarray


@dataclass
class UpdateWorkload:
    """A base set plus a deterministic stream of update epochs."""

    name: str
    base_vids: np.ndarray
    base_vecs: np.ndarray
    epochs: list[Epoch]
    query_vecs: np.ndarray
    dim: int
    live: dict[int, np.ndarray] = field(default_factory=dict)

    def __post_init__(self) -> None:
        self.live = {int(v): x for v, x in zip(self.base_vids, self.base_vecs)}

    def apply(self, epoch: Epoch) -> None:
        """Track the live set as an epoch is fed to a system under test."""
        for v in epoch.delete_vids:
            self.live.pop(int(v), None)
        for v, x in zip(epoch.insert_vids, epoch.insert_vecs):
            self.live[int(v)] = x

    def live_arrays(self) -> tuple[np.ndarray, np.ndarray]:
        vids = np.asarray(sorted(self.live), dtype=np.int64)
        vecs = np.stack([self.live[int(v)] for v in vids])
        return vids, vecs

    def ground_truth(self, k: int) -> tuple[np.ndarray, np.ndarray]:
        """(vids of live set order, (nq, k) ground-truth vid matrix)."""
        vids, vecs = self.live_arrays()
        gt_idx = ground_truth_knn(vecs, self.query_vecs, k)
        return vids, vids[gt_idx]


def make_workload(
    kind: str,
    *,
    n_base: int = 20_000,
    dim: int = 32,
    n_clusters: int = 64,
    n_epochs: int = 50,
    rate: float = 0.01,
    delete_rate: float | None = None,
    n_queries: int = 200,
    shift: float = 0.8,
    seed: int = 0,
) -> UpdateWorkload:
    """Build Workload A (``kind='spacev'``) or B (``kind='sift'``).

    ``shift`` controls how far the update pool's mixture weights drift
    from the base for the SPACEV-like workload (0 = no drift).
    ``delete_rate`` defaults to ``rate`` (the paper's steady-state 1%
    delete + 1% insert); pass 0 for an insert-only growth stream (the
    §2.3 / Fig. 2 microbenchmark).
    """
    if kind not in ("spacev", "sift"):
        raise ValueError(f"unknown workload kind {kind!r}")
    skew = 1.1 if kind == "spacev" else 0.0
    centers = mixture_centers(n_clusters=n_clusters, dim=dim, seed=seed + 1)
    if skew > 0:
        w = 1.0 / np.arange(1, n_clusters + 1) ** skew
    else:
        w = np.ones(n_clusters)
    base_w = w / w.sum()
    pool_w = shifted_weights(base_w, shift=shift, seed=seed + 7) if kind == "spacev" else base_w

    base_vecs = clustered_vectors(
        n=n_base, dim=dim, seed=seed, centers=centers, weights=base_w
    )
    base_vids = np.arange(n_base, dtype=np.int64)
    per_epoch = max(1, int(n_base * rate))
    pool_vecs = clustered_vectors(
        n=per_epoch * n_epochs, dim=dim, seed=seed + 2, centers=centers, weights=pool_w
    )
    # queries follow the *final* blended distribution so freshness matters
    q_w = 0.5 * base_w + 0.5 * pool_w
    query_vecs = clustered_vectors(
        n=n_queries, dim=dim, seed=seed + 3, centers=centers, weights=q_w / q_w.sum()
    )

    rng = np.random.default_rng(seed + 4)
    live_ids = list(base_vids)
    next_vid = n_base
    epochs: list[Epoch] = []
    at = 0
    per_epoch_del = per_epoch if delete_rate is None else max(0, int(n_base * delete_rate))
    for _ in range(n_epochs):
        dels = rng.choice(len(live_ids), size=per_epoch_del, replace=False)
        delete_vids = np.asarray([live_ids[i] for i in dels], dtype=np.int64)
        keep = np.ones(len(live_ids), dtype=bool)
        keep[dels] = False
        live_ids = [v for v, k_ in zip(live_ids, keep) if k_]
        ins_vecs = pool_vecs[at : at + per_epoch]
        at += per_epoch
        ins_vids = np.arange(next_vid, next_vid + per_epoch, dtype=np.int64)
        next_vid += per_epoch
        live_ids.extend(int(v) for v in ins_vids)
        epochs.append(Epoch(delete_vids, ins_vids, ins_vecs))
    return UpdateWorkload(
        name=f"workload-{kind}", base_vids=base_vids, base_vecs=base_vecs,
        epochs=epochs, query_vecs=query_vecs, dim=dim,
    )
