"""Analytic I/O and compute cost model for the serving simulator.

The paper's testbed is an AWS r4.xlarge with a 128 GB SSD (EBS) and a 128 GB
HDD volume. We model page I/O as seek + size/bandwidth with effective rates
chosen to land in the paper's regime (EBS gp2-class SSD ~128 MB/s; a
throughput- and seek-limited magnetic volume ~15 MB/s under the serving
workload's mixed access pattern). Compute throughput is per workload (the
paper's netsDB executes UDF-nested relational kernels; its effective FLOP
rate differs between the one-hot word2vec matmul and the dense FFNN — see
`models.zoo.ServingProfile.compute_gflops`).

Absolute seconds are NOT expected to match the paper (different hardware and
a simulated engine); ratios and crossovers are what the evaluation checks.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class DiskProfile:
    """Sequential-ish effective bandwidth + per-page seek overhead."""

    name: str
    read_mbps: float
    write_mbps: float
    seek_seconds: float

    def read_seconds(self, nbytes: int) -> float:
        return self.seek_seconds + nbytes / (self.read_mbps * 2**20)

    def write_seconds(self, nbytes: int) -> float:
        return self.seek_seconds + nbytes / (self.write_mbps * 2**20)


SSD = DiskProfile("SSD", read_mbps=128.0, write_mbps=110.0, seek_seconds=0.0002)
HDD = DiskProfile("HDD", read_mbps=15.0, write_mbps=14.0, seek_seconds=0.010)

DISKS = {"SSD": SSD, "HDD": HDD}

# CPU overhead charged per buffer-pool access (pin/unpin, hash lookups).
PER_ACCESS_CPU_SECONDS = 1e-4


def compute_seconds(flops: float, gflops: float) -> float:
    """Kernel execution time for a given workload FLOP count."""
    return flops / (gflops * 1e9)
