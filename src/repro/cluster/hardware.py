"""Hardware specifications of the paper's two experimental clusters.

Paper Section 4.1: a four-node ARM cluster (KUNPENG 920, 4 x 32 cores and
512 GB per node; one master + three workers) and an eight-node x86
cluster (2 x Xeon Silver 4114 ten-core, 64 GB per node; one master +
seven workers). Only worker resources execute tasks. Container caps
mirror the paper's Section 5.12 range determination (executor cores /
memory ranges equal the YARN container capacity: 8 cores / 32 GB on ARM,
16 cores / 48 GB on x86).
"""
from __future__ import annotations

from dataclasses import dataclass

__all__ = ["ClusterSpec", "ARM_CLUSTER", "X86_CLUSTER"]


@dataclass(frozen=True)
class ClusterSpec:
    """Static resources of a simulated cluster."""

    name: str
    n_workers: int
    cores_per_worker: int
    mem_per_worker_gb: float
    container_max_cores: int
    container_max_mem_gb: float
    net_gbps: float  # per-node NIC bandwidth
    disk_gbps: float  # per-node aggregate disk bandwidth (GB/s)
    cpu_factor: float  # per-core relative speed (x86 Xeon = 1.0)

    @property
    def total_cores(self) -> int:
        return self.n_workers * self.cores_per_worker

    @property
    def total_mem_gb(self) -> float:
        return self.n_workers * self.mem_per_worker_gb

    @property
    def net_total_gBps(self) -> float:
        """Aggregate cluster network bandwidth in GB/s."""
        return self.n_workers * self.net_gbps / 8.0

    @property
    def disk_total_gBps(self) -> float:
        return self.n_workers * self.disk_gbps


#: Four-node ARM cluster: 3 workers x 128 cores / 512 GB.
ARM_CLUSTER = ClusterSpec(
    name="arm4",
    n_workers=3,
    cores_per_worker=128,
    mem_per_worker_gb=512.0,
    container_max_cores=8,
    container_max_mem_gb=32.0,
    net_gbps=10.0,
    disk_gbps=1.5,
    cpu_factor=0.8,
)

#: Eight-node x86 cluster: 7 workers x 20 cores / 64 GB.
X86_CLUSTER = ClusterSpec(
    name="x86_8",
    n_workers=7,
    cores_per_worker=20,
    mem_per_worker_gb=64.0,
    container_max_cores=16,
    container_max_mem_gb=48.0,
    net_gbps=10.0,
    disk_gbps=1.0,
    cpu_factor=1.0,
)
