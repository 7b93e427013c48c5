"""Model compression interplay (paper Sec. 7.6, Table 14).

Pruning and quantization are *per-model* techniques; deduplication is a
*cross-model* technique. The paper's observation: dedup composes with both,
because pruning/quantization do not significantly change cross-model block
similarity. We implement:

* magnitude pruning — zero the smallest-|w| fraction per model; pruned blocks
  are stored sparse (value + index = 12 bytes/nnz vs 8 bytes dense);
* linear int8 quantization — per-block symmetric scale, stored 1 byte/weight
  (+ one float scale per block, negligible at our block sizes);
* their compositions with dedup (dedup runs on the compressed models).

Compression ratio follows the paper's definition: size after compression /
size before compression (smaller is better). Accuracy drop is the maximum
drop across models, measured with the workload's real evaluator.
"""
from __future__ import annotations

from dataclasses import dataclass, replace
from typing import Dict, List

import numpy as np

from repro.core.dedup_index import dedup_proposed
from repro.models.zoo import ModelSpec, Workload
from repro.paging.packing import pack_two_stage
from repro.serving.workload import no_dedup_tensor_blocks

SPARSE_BYTES_PER_NNZ = 12  # 8-byte value + 4-byte index
DENSE_BYTES_PER_WEIGHT = 8
INT8_BYTES_PER_WEIGHT = 1


def prune_model(model: ModelSpec, fraction: float, threshold: float | None = None) -> ModelSpec:
    """Zero the smallest-magnitude ``fraction`` of the model's weights, as in
    iterative magnitude pruning. ``threshold`` overrides the per-model
    quantile — the Table 14 harness prunes every model with one common
    threshold (the same pruning configuration), which also keeps the zero
    patterns of near-identical blocks aligned across models; per-model
    quantile jitter would otherwise destroy cross-model block similarity."""
    if not 0.0 <= fraction < 1.0:
        raise ValueError("fraction must be in [0, 1)")
    if threshold is None:
        all_vals = np.concatenate([np.abs(a).ravel() for a in model.all_blocks().values()])
        threshold = float(np.quantile(all_vals, fraction))
    tensors = {
        tname: {pos: np.where(np.abs(a) >= threshold, a, 0.0) for pos, a in blocks.items()}
        for tname, blocks in model.tensors.items()
    }
    return replace(model, tensors=tensors)


def common_prune_threshold(models: List[ModelSpec], fraction: float) -> float:
    sample = np.concatenate(
        [np.abs(a).ravel() for m in models for a in m.all_blocks().values()]
    )
    return float(np.quantile(sample, fraction))


def quantize_model(model: ModelSpec, bits: int = 8) -> ModelSpec:
    """Symmetric linear quantization per block, returned dequantized (the
    values the model would actually serve with)."""
    qmax = 2 ** (bits - 1) - 1
    tensors = {}
    for tname, blocks in model.tensors.items():
        out = {}
        for pos, a in blocks.items():
            scale = np.abs(a).max() / qmax
            if scale == 0:
                out[pos] = a.copy()
            else:
                out[pos] = np.round(a / scale) * scale
        tensors[tname] = out
    return replace(model, tensors=tensors)


def transform_workload(workload: Workload, fn) -> Workload:
    return replace(workload, models=[fn(m) for m in workload.models])


def nnz_ratio(models: List[ModelSpec]) -> float:
    nnz = total = 0
    for m in models:
        for a in m.all_blocks().values():
            nnz += int(np.count_nonzero(a))
            total += a.size
    return nnz / total


def max_accuracy_drop(original: Workload, compressed: Workload) -> float:
    """Max accuracy drop across models, evaluated with the original labels."""
    drops = []
    for orig, comp in zip(original.models, compressed.models):
        a0 = original.evaluator.accuracy(orig, orig.all_blocks())
        a1 = original.evaluator.accuracy(orig, comp.all_blocks())
        drops.append(a0 - a1)
    return max(drops)


def dedup_page_ratio(workload: Workload):
    """(pages after dedup + two-stage packing / pages without dedup, result)."""
    res = dedup_proposed(workload)
    tb = res.tensor_block_lists()
    packed = pack_two_stage(tb, workload.blocks_per_page)
    n_before = sum(
        -(-len(v) // workload.blocks_per_page)
        for v in no_dedup_tensor_blocks(workload).values()
    )
    return packed.n_pages() / n_before, res


@dataclass
class CompressionRow:
    technique: str
    max_accuracy_drop: float
    compression_ratio: float


def compression_table(workload: Workload, prune_fraction: float = 0.85) -> List[CompressionRow]:
    """Reproduce Table 14's five technique columns on one workload."""
    rows: List[CompressionRow] = []

    thresh = common_prune_threshold(workload.models, prune_fraction)
    pruned = transform_workload(
        workload, lambda m: prune_model(m, prune_fraction, threshold=thresh)
    )
    sparse = nnz_ratio(pruned.models) * SPARSE_BYTES_PER_NNZ / DENSE_BYTES_PER_WEIGHT
    rows.append(CompressionRow("pruning", max_accuracy_drop(workload, pruned), sparse))

    quant = transform_workload(workload, quantize_model)
    rows.append(
        CompressionRow(
            "quantization",
            max_accuracy_drop(workload, quant),
            INT8_BYTES_PER_WEIGHT / DENSE_BYTES_PER_WEIGHT,
        )
    )

    ratio, res = dedup_page_ratio(workload)
    rows.append(
        CompressionRow(
            "dedup",
            max(res.accuracy_drop().values()),
            ratio,
        )
    )

    # Combined drops are measured end-to-end: original accuracy minus the
    # accuracy after compress-then-dedup (not the max of the two stages).
    orig_acc = {
        m.model_id: workload.evaluator.accuracy(m, m.all_blocks())
        for m in workload.models
    }

    ratio_p, res_p = dedup_page_ratio(pruned)
    rows.append(
        CompressionRow(
            "dedup+pruning",
            max(orig_acc[m] - res_p.accuracy_after[m] for m in orig_acc),
            ratio_p * sparse,
        )
    )

    ratio_q, res_q = dedup_page_ratio(quant)
    rows.append(
        CompressionRow(
            "dedup+quant",
            max(orig_acc[m] - res_q.accuracy_after[m] for m in orig_acc),
            ratio_q * INT8_BYTES_PER_WEIGHT / DENSE_BYTES_PER_WEIGHT,
        )
    )
    return rows
