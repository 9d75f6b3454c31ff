"""LIRE rebalancing as incremental Spark jobs (paper §3.2–§3.3, §4.2).

One ``rebalance`` call plays the role of draining the Local Rebuilder's
job queue after a batch of foreground updates:

- **split job** — one distributed pass: the live rows of every oversized
  posting are grouped by pid and split with balanced 2-means inside
  ``applyInPandas``; the driver registers the new centroids (its centroid
  index is the paper's in-memory SPTAG index) and the new-pid rows are
  appended. Old-pid rows die via the alive-pid filter in ``live_df``.
- **reassign job** — one distributed pass: live rows of the split
  postings and their ``reassign_range`` nearest neighbor postings are
  screened with LIRE's two necessary conditions (broadcast split info),
  surviving candidates get their closure re-computed against the post-
  split centroid set; actual moves CAS-bump the version map on the
  driver and append rows at the new version (old replicas become stale).
- **merge job** — undersized postings are folded into their nearest
  posting; moved vectors get the merge-path reassign check (no neighbor
  scan, per §4.2.1).
- **compaction** — a dataset rewrite keeping only live rows: the GC that
  the paper performs inside split jobs, at dataset granularity.

Split→reassign→split cascades are the convergence loop of §3.4: the
round loop terminates because every split grows the centroid set by one
and |C| ≤ |V|.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.clustering import balanced_two_means, closure_assign
from repro.core.lire import condition_one, condition_two
from repro.spark_index.store import SparkPostingStore, rows_to_pdf

_SPLIT_OUT_SCHEMA = T.StructType(
    [
        T.StructField("old_pid", T.LongType(), False),
        T.StructField("sub", T.IntegerType(), False),
        T.StructField("vid", T.LongType(), False),
        T.StructField("version", T.IntegerType(), False),
        T.StructField("vec", T.ArrayType(T.DoubleType()), False),
        T.StructField("cvec", T.ArrayType(T.DoubleType()), False),
    ]
)

_CAND_SCHEMA = T.StructType(
    [
        T.StructField("vid", T.LongType(), False),
        T.StructField("version", T.IntegerType(), False),
        T.StructField("cur_pid", T.LongType(), False),
        T.StructField("vec", T.ArrayType(T.DoubleType()), False),
    ]
)


@dataclass
class SplitInfo:
    old_pid: int
    old_centroid: np.ndarray
    new_pids: list[int]
    new_centroids: np.ndarray


@dataclass
class RebalanceStats:
    rounds: int = 0
    splits: int = 0
    merges: int = 0
    reassign_evaluated: int = 0
    reassign_moved: int = 0
    split_pids: list[int] = field(default_factory=list)


def _split_job(store: SparkPostingStore, oversized_pids: list[int]) -> list[SplitInfo]:
    """Distributed balanced 2-means over every oversized posting."""
    live = store.live_df().where(F.col("pid").isin([int(p) for p in oversized_pids]))
    seed = store.config.seed

    def split_one(pdf: pd.DataFrame) -> pd.DataFrame:
        pid = int(pdf["pid"].iloc[0])
        vecs = np.stack(pdf["vec"].map(np.asarray))
        centers, labels = balanced_two_means(vecs, seed=seed + pid)
        return pd.DataFrame(
            {
                "old_pid": pid,
                "sub": labels.astype(np.int32),
                "vid": pdf["vid"].to_numpy(np.int64),
                "version": pdf["version"].to_numpy(np.int32),
                "vec": pdf["vec"].to_numpy(),
                "cvec": [centers[l].tolist() for l in labels],
            }
        )

    out = live.groupBy("pid").applyInPandas(split_one, schema=_SPLIT_OUT_SCHEMA).toPandas()
    infos: list[SplitInfo] = []
    new_rows = []
    for old_pid, grp in out.groupby("old_pid"):
        old_centroid = store.centroid_index.centroid(int(old_pid)).copy()
        new_pids, new_cents = [], []
        for sub, sg in grp.groupby("sub"):
            c = np.asarray(sg["cvec"].iloc[0])
            pid = store.centroid_index.add(c)
            new_pids.append(pid)
            new_cents.append(c)
            new_rows.append(
                rows_to_pdf(
                    np.full(len(sg), pid),
                    sg["vid"].to_numpy(),
                    sg["version"].to_numpy(),
                    list(sg["vec"]),
                )
            )
        store.centroid_index.remove(int(old_pid))
        infos.append(SplitInfo(int(old_pid), old_centroid, new_pids, np.stack(new_cents)))
    if new_rows:
        store.append_rows(pd.concat(new_rows, ignore_index=True))
    return infos


def _reassign_job(store: SparkPostingStore, infos: list[SplitInfo], stats: RebalanceStats) -> None:
    """Condition screening + closure recompute as one distributed pass."""
    cfg = store.config
    if not infos:
        return
    # pid → split assignments (a pid can neighbor several splits)
    mapping_rows = []
    split_payload = {}
    for sid, info in enumerate(infos):
        split_payload[sid] = (info.old_centroid, info.new_centroids)
        for pid in info.new_pids:
            mapping_rows.append((int(pid), sid, True))
        if cfg.reassign_range > 0:
            nbr = [
                int(p)
                for p in store.centroid_index.search(
                    info.old_centroid, cfg.reassign_range + len(info.new_pids)
                )
                if int(p) not in info.new_pids
            ][: cfg.reassign_range]
            for pid in nbr:
                mapping_rows.append((int(pid), sid, False))
    mapping_pdf = pd.DataFrame(mapping_rows, columns=["pid", "split_id", "is_split"])
    mapping = store.spark.createDataFrame(mapping_pdf)
    bc = store.spark.sparkContext.broadcast(split_payload)

    def screen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        payload = bc.value
        for pdf in batches:
            if not len(pdf):
                continue
            keep_rows = []
            for (sid, is_split), grp in pdf.groupby(["split_id", "is_split"]):
                old_c, new_c = payload[int(sid)]
                vecs = np.stack(grp["vec"].map(np.asarray))
                mask = (
                    condition_one(vecs, old_c, new_c)
                    if is_split
                    else condition_two(vecs, old_c, new_c)
                )
                if mask.any():
                    keep_rows.append(grp.iloc[np.flatnonzero(mask)])
            if keep_rows:
                sel = pd.concat(keep_rows)
                yield pd.DataFrame(
                    {
                        "vid": sel["vid"].to_numpy(np.int64),
                        "version": sel["version"].to_numpy(np.int32),
                        "cur_pid": sel["pid"].to_numpy(np.int64),
                        "vec": sel["vec"].to_numpy(),
                    }
                )

    live = store.live_df()
    scanned = live.join(mapping, on="pid")
    stats.reassign_evaluated += scanned.count()
    cand = scanned.mapInPandas(screen, schema=_CAND_SCHEMA).toPandas()
    if not len(cand):
        return
    cand = cand.drop_duplicates(subset=["vid"], keep="first")
    _execute_moves(store, cand, stats)


def _execute_moves(
    store: SparkPostingStore, cand: pd.DataFrame, stats: RebalanceStats
) -> pd.DataFrame | None:
    """Final NPA check + CAS version bump + append at the new version.

    Returns the appended rows (or ``None``) so callers that operate on a
    live-rows snapshot (the merge job) can overlay them.
    """
    cfg = store.config
    alive = store.centroid_index.alive_ids
    cents = store.centroid_index.centroids(alive)
    vecs = np.stack(cand["vec"].map(np.asarray))
    assign = closure_assign(vecs, cents, max_replicas=cfg.max_replicas, eps=cfg.closure_eps)
    out_pid, out_vid, out_ver, out_vec = [], [], [], []
    for row in range(len(cand)):
        primary = int(alive[assign[row][0]])
        cur_pid = int(cand["cur_pid"].iloc[row])
        if primary == cur_pid:
            continue  # false positive — already NPA-compliant
        vid = int(cand["vid"].iloc[row])
        new_ver = store.version_map.bump_cas(vid, int(cand["version"].iloc[row]))
        if new_ver is None:
            continue  # concurrent move/delete won the CAS
        for c in assign[row]:
            out_pid.append(int(alive[c]))
            out_vid.append(vid)
            out_ver.append(new_ver)
            out_vec.append(vecs[row])
        stats.reassign_moved += 1
    if out_pid:
        pdf = rows_to_pdf(out_pid, out_vid, out_ver, out_vec)
        store.append_rows(pdf)
        return pdf
    return None


def _merge_job(store: SparkPostingStore, undersized_pids: list[int], stats: RebalanceStats) -> None:
    """Fold undersized postings into their nearest posting (§3.2).

    Works off one live-rows snapshot plus an overlay of rows appended by
    earlier merges in this job — a later merge may dissolve a posting an
    earlier merge just appended into, and those rows must move along.
    """
    cfg = store.config
    live = store.live_df().where(F.col("pid").isin([int(p) for p in undersized_pids])).toPandas()
    overlay: list[pd.DataFrame] = []

    def rows_for(pid: int) -> pd.DataFrame:
        parts = [live[live["pid"] == pid]]
        parts += [o[o["pid"] == pid] for o in overlay]
        rows = pd.concat(parts, ignore_index=True)
        if not len(rows):
            return rows
        current = rows.apply(
            lambda r: store.version_map.version(int(r["vid"])) == int(r["version"])
            and not store.version_map.is_deleted(int(r["vid"])),
            axis=1,
        )
        return rows[current].drop_duplicates(subset=["vid"], keep="first")

    for pid in undersized_pids:
        pid = int(pid)
        if pid not in store.centroid_index or len(store.centroid_index) <= 1:
            continue
        rows = rows_for(pid)
        centroid = store.centroid_index.centroid(pid).copy()
        near = [int(p) for p in store.centroid_index.search(centroid, 2) if int(p) != pid]
        if not near:
            continue
        target = near[0]
        store.centroid_index.remove(pid)
        stats.merges += 1
        if not len(rows):
            continue
        # merge-path reassign check on the moved vectors (no neighbor scan)
        cand = pd.DataFrame(
            {
                "vid": rows["vid"].to_numpy(np.int64),
                "version": rows["version"].to_numpy(np.int32),
                "cur_pid": np.full(len(rows), target, dtype=np.int64),
                "vec": rows["vec"].to_numpy(),
            }
        )
        stats.reassign_evaluated += len(cand)
        appended = _execute_moves(store, cand, stats)
        if appended is not None:
            overlay.append(appended)
        # vectors that did not move elsewhere land in the target posting
        # at their current version
        keep_mask = []
        alive = store.centroid_index.alive_ids
        cents = store.centroid_index.centroids(alive)
        vecs = np.stack(rows["vec"].map(np.asarray))
        assign = closure_assign(vecs, cents, max_replicas=cfg.max_replicas, eps=cfg.closure_eps)
        for row in range(len(rows)):
            primary = int(alive[assign[row][0]])
            vid = int(rows["vid"].iloc[row])
            still_current = store.version_map.version(vid) == int(rows["version"].iloc[row])
            keep_mask.append(primary == target and still_current)
        keep = rows.iloc[np.flatnonzero(keep_mask)]
        if len(keep):
            kept_pdf = rows_to_pdf(
                np.full(len(keep), target),
                keep["vid"].to_numpy(),
                keep["version"].to_numpy(),
                list(keep["vec"]),
            )
            store.append_rows(kept_pdf)
            overlay.append(kept_pdf)


def compact(store: SparkPostingStore) -> None:
    """Rewrite the dataset keeping only live rows (split-GC analog).

    The live DataFrame is resolved against the current dataset generation
    and written to the next one, so this is a pure Spark job — no data
    passes through the driver.
    """
    store.write_postings(store.live_df())


def rebalance(store: SparkPostingStore, *, max_rounds: int = 20) -> RebalanceStats:
    """Drain all split/merge/reassign work until the index is balanced."""
    cfg = store.config
    stats = RebalanceStats()
    for _ in range(max_rounds):
        sizes = store.live_sizes()
        oversized = sizes[sizes["n_live"] > cfg.split_limit]["pid"].tolist()
        undersized = (
            sizes[sizes["n_live"] < cfg.merge_limit]["pid"].tolist()
            if cfg.merge and len(store.centroid_index) > 1
            else []
        )
        if not oversized and not undersized:
            break
        stats.rounds += 1
        if oversized:
            infos = _split_job(store, oversized)
            stats.splits += len(infos)
            stats.split_pids.extend(i.old_pid for i in infos)
            if cfg.reassign:
                _reassign_job(store, infos, stats)
        elif undersized:
            _merge_job(store, undersized, stats)
        compact(store)
    store.save_meta()
    return stats
