"""Simulated NVMe SSD: block store with a latency/IOPS cost model.

The paper evaluates on an Azure Lsv3 local NVMe device (max guaranteed
400K IOPS). What its experiments actually measure is *how many blocks each
operation touches* and how well batched I/O hides per-block latency — so
the simulator stores opaque block payloads and charges a deterministic
cost: a batch of ``n`` same-direction I/Os issued together costs
``ceil(n / channels) * latency`` (bounded device parallelism), and every
block touched increments the IOPS counters. Absolute microsecond constants
are calibration knobs; all reproduced results depend on their *ratios*.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field


@dataclass
class SSDCounters:
    """Cumulative device-level I/O accounting."""

    blocks_read: int = 0
    blocks_written: int = 0
    read_batches: int = 0
    write_batches: int = 0
    busy_us: float = 0.0

    def snapshot(self) -> "SSDCounters":
        return SSDCounters(
            self.blocks_read, self.blocks_written, self.read_batches, self.write_batches, self.busy_us
        )

    def delta(self, prev: "SSDCounters") -> "SSDCounters":
        return SSDCounters(
            self.blocks_read - prev.blocks_read,
            self.blocks_written - prev.blocks_written,
            self.read_batches - prev.read_batches,
            self.write_batches - prev.write_batches,
            self.busy_us - prev.busy_us,
        )


@dataclass
class SimulatedSSD:
    """A block device holding opaque payloads with a deterministic cost model.

    Parameters mirror a consumer/cloud NVMe device: 4 KiB blocks, ~90 µs
    random-read latency, ~25 µs write latency (write-back cache), and
    ``channels`` concurrently serviceable commands (queue-depth benefit).
    """

    block_bytes: int = 4096
    read_latency_us: float = 90.0
    write_latency_us: float = 25.0
    channels: int = 8
    counters: SSDCounters = field(default_factory=SSDCounters)

    def __post_init__(self) -> None:
        self._blocks: dict[int, object] = {}

    # -- cost model -------------------------------------------------------
    def read_cost_us(self, n_blocks: int) -> float:
        """Latency of a batch of ``n_blocks`` reads issued concurrently."""
        if n_blocks <= 0:
            return 0.0
        return math.ceil(n_blocks / self.channels) * self.read_latency_us

    def write_cost_us(self, n_blocks: int) -> float:
        if n_blocks <= 0:
            return 0.0
        return math.ceil(n_blocks / self.channels) * self.write_latency_us

    # -- I/O --------------------------------------------------------------
    def read(self, block_ids: list[int]) -> tuple[list[object], float]:
        """Read a batch of blocks; returns (payloads, simulated latency µs)."""
        payloads = [self._blocks[b] for b in block_ids]
        cost = self.read_cost_us(len(block_ids))
        self.counters.blocks_read += len(block_ids)
        self.counters.read_batches += 1
        self.counters.busy_us += cost
        return payloads, cost

    def write(self, items: dict[int, object]) -> float:
        """Write a batch of block payloads; returns simulated latency µs."""
        self._blocks.update(items)
        cost = self.write_cost_us(len(items))
        self.counters.blocks_written += len(items)
        self.counters.write_batches += 1
        self.counters.busy_us += cost
        return cost

    def discard(self, block_ids: list[int]) -> None:
        """Drop payloads of released blocks (free-pool trim; no I/O cost)."""
        for b in block_ids:
            self._blocks.pop(b, None)

    @property
    def blocks_in_use(self) -> int:
        return len(self._blocks)
