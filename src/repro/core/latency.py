"""Latency model: op counts → simulated microseconds.

The paper's latency numbers come from a real NVMe device plus in-memory
compute. Our reproduction measures the *drivers* of those numbers — blocks
read/written (via the Block Controller), centroids compared, vectors
scanned — and converts them to time with fixed constants. The constants
are calibrated once (roughly Lsv3-class hardware) and shared by every
system so comparisons are apples-to-apples; see DESIGN.md §2.

Components of a cluster-index search (paper §3.1):
  navigation (in-memory centroid search) + ParallelGET of nprobe postings
  (device model from :class:`SimulatedSSD`) + scan of fetched tuples.
An insert: navigation + APPEND (last-block RMW).
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass
class LatencyModel:
    """Microsecond cost constants for in-memory work.

    ``scan_ns_per_dim``: per-dimension distance compute while scanning
    posting tuples (SIMD-ish). ``centroid_ns_per_dim``: same for the
    in-memory navigation structure. ``base_us``: fixed per-query software
    overhead (dispatch, result heap).
    """

    scan_ns_per_dim: float = 1.2
    centroid_ns_per_dim: float = 0.8
    base_us: float = 30.0

    def navigation_us(self, n_centroids_compared: int, dim: int) -> float:
        return n_centroids_compared * dim * self.centroid_ns_per_dim / 1000.0

    def scan_us(self, n_vectors: int, dim: int) -> float:
        return n_vectors * dim * self.scan_ns_per_dim / 1000.0

    def search_us(
        self,
        *,
        n_centroids_compared: int,
        vectors_scanned: int,
        dim: int,
        io_us: float,
    ) -> float:
        return (
            self.base_us
            + self.navigation_us(n_centroids_compared, dim)
            + self.scan_us(vectors_scanned, dim)
            + io_us
        )

    def insert_us(self, *, n_centroids_compared: int, dim: int, io_us: float) -> float:
        return self.base_us + self.navigation_us(n_centroids_compared, dim) + io_us
