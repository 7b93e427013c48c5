"""Deep-learning-framework serving baseline ("TensorFlow" in Tables 3 and 8).

TensorFlow is not installed in this offline container and there is no GPU, so
the framework side is an analytic cost model with *honest hard memory
accounting* — which is the property the paper's comparison actually
establishes: a compute-focused framework must fit models + inputs +
framework overhead in memory and **fails** otherwise, while the database
keeps serving from its buffer pool.

Cost structure per serving request:

    latency = source_load + host_to_device_transfer (GPU) + compute
    compute = flops / effective_gflops   (matmul path)
            = n_ids * per_id_seconds     (embedding-lookup path)

Memory check (fail => the paper's "Failed" cell):

    models_bytes * overhead_factor + input_bytes * (1 + source_extra) > budget

Constants are documented inline and calibrated against the magnitudes in
Tables 3/8 (e.g. CSV parse ~14 MB/s explains both TF-file columns; per-BLOB
fetch overhead of ~2 ms explains why 400-BLOB word2vec rows cost ~90 s while
the FFNN's 1-BLOB rows cost ~2 s).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

GB = 2**30

# -- input sources ----------------------------------------------------------
CSV_MBPS = 14.0  # text parse of numeric CSV, single core
DB_MBPS = 100.0  # bulk BLOB bandwidth from PostgreSQL
DB_PER_BLOB_SECONDS = 0.002  # per-BLOB fetch/deserialize overhead
# Extra transient memory the source path needs, as a multiple of input size
# (CSV parse buffers ~2x; DB client buffers ~0.5x).
SOURCE_EXTRA = {"mem": 0.0, "file": 2.0, "db": 0.5}


@dataclass(frozen=True)
class FrameworkSpec:
    name: str
    memory_budget_bytes: int
    matmul_gflops: float
    per_id_seconds: float  # embedding-lookup path
    overhead_matmul: float  # resident model memory multiplier
    overhead_embedding: float  # Keras embedding variables are far heavier
    pcie_gbps: float = 0.0  # >0 => weights+input cross PCIe each serving
    base_overhead_seconds: float = 0.0


# r4.xlarge: 30 GB RAM, 4 vCPU (MKL matmul ~33 GF measured-scale);
# g4dn.2xlarge: T4 16 GB. The paper observed no GPU gain for inference
# batches of this shape (PCIe transfer dominates), hence the modest kernel
# advantage and the 1.2 GB/s effective transfer rate.
TF_CPU = FrameworkSpec(
    name="TensorFlow CPU",
    memory_budget_bytes=30 * GB,
    matmul_gflops=33.0,
    per_id_seconds=1.9e-5,
    overhead_matmul=1.35,
    overhead_embedding=2.5,
)
TF_CPU_DENSE = FrameworkSpec(  # dense FFNN kernels vectorize better
    name="TensorFlow CPU",
    memory_budget_bytes=30 * GB,
    matmul_gflops=56.0,
    per_id_seconds=1.9e-5,
    overhead_matmul=1.35,
    overhead_embedding=2.5,
)
TF_GPU = FrameworkSpec(
    name="TensorFlow GPU",
    memory_budget_bytes=16 * GB,
    matmul_gflops=2000.0,
    per_id_seconds=1.0e-5,
    overhead_matmul=1.12,
    overhead_embedding=2.8,
    pcie_gbps=1.2,
    base_overhead_seconds=2.0,
)


@dataclass
class FrameworkResult:
    latency_seconds: Optional[float]  # None == Failed (working set > memory)
    working_set_bytes: int

    @property
    def failed(self) -> bool:
        return self.latency_seconds is None

    def cell(self) -> str:
        return "Failed" if self.failed else f"{self.latency_seconds:.0f}"


def _source_seconds(source: str, input_bytes: int, n_blobs: int) -> float:
    if source not in SOURCE_EXTRA:
        raise ValueError(f"unknown source {source!r}; use mem/file/db")
    if source == "mem":
        return 0.0
    if source == "file":
        return input_bytes / (CSV_MBPS * 2**20)
    if source == "db":
        return input_bytes / (DB_MBPS * 2**20) + n_blobs * DB_PER_BLOB_SECONDS
    raise ValueError(f"unknown source {source!r}")


def serve_matmul(
    fw: FrameworkSpec,
    *,
    n_models: int,
    model_bytes: int,
    input_bytes: int,
    flops_per_model: float,
    source: str,
    n_blobs: int = 0,
) -> FrameworkResult:
    """Matrix-multiplication-based inference (Table 3 top / Table 8)."""
    if source not in SOURCE_EXTRA:
        raise ValueError(f"unknown source {source!r}; use mem/file/db")
    # GPU budget covers device memory only: model variables + input tensor.
    # Source parse buffers live in host RAM (assumed sufficient on g4dn).
    src_extra = 0.0 if fw.pcie_gbps > 0 else SOURCE_EXTRA[source]
    working = int(
        n_models * model_bytes * fw.overhead_matmul + input_bytes * (1.0 + src_extra)
    )
    if working > fw.memory_budget_bytes:
        return FrameworkResult(None, working)
    lat = _source_seconds(source, input_bytes, n_blobs)
    lat += n_models * flops_per_model / (fw.matmul_gflops * 1e9)
    if fw.pcie_gbps > 0:
        lat += (n_models * model_bytes + input_bytes) / (fw.pcie_gbps * GB)
    return FrameworkResult(lat + fw.base_overhead_seconds, working)


def serve_embedding_lookup(
    fw: FrameworkSpec,
    *,
    n_models: int,
    model_bytes: int,
    input_bytes: int,
    n_ids: int,
    source: str,
    n_blobs: int = 0,
) -> FrameworkResult:
    """Keras embedding-lookup inference (Table 3 bottom; single precision)."""
    if source not in SOURCE_EXTRA:
        raise ValueError(f"unknown source {source!r}; use mem/file/db")
    src_extra = 0.0 if fw.pcie_gbps > 0 else SOURCE_EXTRA[source]
    working = int(
        n_models * model_bytes * fw.overhead_embedding + input_bytes * (1.0 + src_extra)
    )
    if working > fw.memory_budget_bytes:
        return FrameworkResult(None, working)
    lat = _source_seconds(source, input_bytes, n_blobs)
    lat += n_models * n_ids * fw.per_id_seconds
    if fw.pcie_gbps > 0:
        lat += (n_models * model_bytes + input_bytes) / (fw.pcie_gbps * GB)
    return FrameworkResult(lat + fw.base_overhead_seconds, working)
