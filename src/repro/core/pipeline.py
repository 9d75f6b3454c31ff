"""Thread-scaling throughput models (paper Figs. 8 & 12, Tables 2 & 3).

The paper's thread-scaling experiments measure two bottleneck structures:

- **Search scaling (Fig. 8)**: search QPS grows with search threads until
  the NVMe device IOPS saturates (~8 threads on Lsv3, 400K guaranteed
  IOPS). Model: ``QPS(t) = min(t / cpu_us_per_query, IOPS / blocks_per_query)``.
- **Fore/background balance (Fig. 12)**: the Updater (foreground) and
  Local Rebuilder (background) form a feed-forward pipeline; steady-state
  update throughput is the min of producer and consumer rates. Model:
  ``QPS(f, b) = min(f / fore_us, b / back_us_amortized)`` where the
  background per-update cost is the *amortized* rebalance work (most
  inserts trigger none; ~0.4% trigger splits+reassigns).

All per-op microsecond costs are *measured* from the simulated engine by
the harness (not hand-picked), so the crossover points are emergent.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass
class SearchScalingModel:
    """QPS / device-IOPS vs number of search threads."""

    cpu_us_per_query: float  # in-memory navigation + scan per query
    blocks_per_query: float  # ParallelGET blocks fetched per query
    device_iops: float = 400_000.0  # Azure Lsv3 guaranteed IOPS

    def qps(self, threads: int) -> float:
        cpu_bound = threads * 1e6 / self.cpu_us_per_query
        io_bound = self.device_iops / max(self.blocks_per_query, 1e-9)
        return min(cpu_bound, io_bound)

    def iops(self, threads: int) -> float:
        return self.qps(threads) * self.blocks_per_query

    def saturation_threads(self) -> int:
        """Smallest thread count at which the device IOPS binds."""
        t = 1
        while self.qps(t) < self.qps(t + 1) and t < 64:
            t += 1
        return t


@dataclass
class UpdatePipelineModel:
    """Feed-forward Updater → Local Rebuilder pipeline throughput."""

    fore_us_per_update: float  # foreground append cost per update
    back_us_per_update: float  # amortized background rebalance cost per update

    def qps(self, fore_threads: int, back_threads: int) -> float:
        fore = fore_threads * 1e6 / self.fore_us_per_update
        back = (
            back_threads * 1e6 / self.back_us_per_update
            if self.back_us_per_update > 0
            else float("inf")
        )
        return min(fore, back)

    def background_keeps_up(self, fore_threads: int, back_threads: int) -> bool:
        """True iff the rebuilder is not the pipeline bottleneck."""
        return self.qps(fore_threads, back_threads) >= (
            fore_threads * 1e6 / self.fore_us_per_update
        ) * (1 - 1e-9)

    def min_back_threads(self, fore_threads: int, max_threads: int = 64) -> int:
        """Fewest background threads that keep up with ``fore_threads``."""
        for b in range(1, max_threads + 1):
            if self.background_keeps_up(fore_threads, b):
                return b
        return max_threads
