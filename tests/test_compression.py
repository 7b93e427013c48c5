"""Pruning / quantization / dedup interplay (compression.py, Table 14)."""
import numpy as np
import pytest

from repro import compression as C
from repro.models.zoo import ModelSpec


def _model(seed=0, n_blocks=4, shape=(8, 8)):
    g = np.random.default_rng(seed)
    return ModelSpec(
        model_id=f"m{seed}",
        tensors={"w": {(0, i): g.normal(size=shape) for i in range(n_blocks)}},
    )


def test_prune_zeroes_expected_fraction():
    m = C.prune_model(_model(), 0.8)
    assert C.nnz_ratio([m]) == pytest.approx(0.2, abs=0.02)


def test_prune_keeps_large_weights():
    m = _model()
    pruned = C.prune_model(m, 0.9)
    for key, arr in m.tensors["w"].items():
        big = np.abs(arr) > 2.0
        np.testing.assert_array_equal(pruned.tensors["w"][key][big], arr[big])


def test_prune_common_threshold_preserves_similarity():
    m1 = _model(1)
    # near-duplicate model
    m2 = ModelSpec(
        model_id="m2",
        tensors={"w": {k: v + 1e-7 for k, v in m1.tensors["w"].items()}},
    )
    thresh = C.common_prune_threshold([m1, m2], 0.8)
    p1 = C.prune_model(m1, 0.8, threshold=thresh)
    p2 = C.prune_model(m2, 0.8, threshold=thresh)
    # Zero patterns stay aligned up to quantile-interpolation boundary
    # effects (the common threshold may land inside one (v, v+eps) pair).
    mismatches = sum(
        int(((p1.tensors["w"][k] == 0) != (p2.tensors["w"][k] == 0)).sum())
        for k in p1.tensors["w"]
    )
    assert mismatches <= 2


def test_prune_bad_fraction():
    with pytest.raises(ValueError):
        C.prune_model(_model(), 1.0)


def test_quantize_error_bounded_by_half_scale():
    m = _model(2)
    q = C.quantize_model(m, bits=8)
    for key, arr in m.tensors["w"].items():
        scale = np.abs(arr).max() / 127
        assert np.abs(q.tensors["w"][key] - arr).max() <= scale / 2 + 1e-12


def test_quantize_zero_block_untouched():
    m = ModelSpec(model_id="z", tensors={"w": {(0, 0): np.zeros((4, 4))}})
    q = C.quantize_model(m)
    np.testing.assert_array_equal(q.tensors["w"][(0, 0)], np.zeros((4, 4)))


def test_sparse_ratio_constant():
    assert C.SPARSE_BYTES_PER_NNZ / C.DENSE_BYTES_PER_WEIGHT == 1.5


@pytest.mark.slow
def test_compression_table_shapes(textclf_wl):
    rows = {r.technique: r for r in C.compression_table(textclf_wl)}
    assert set(rows) == {"pruning", "quantization", "dedup", "dedup+pruning", "dedup+quant"}
    # Paper Table 14 shapes: quantization ratio exactly 12.5%; combined
    # techniques compress far better than any single one; drops bounded.
    assert rows["quantization"].compression_ratio == pytest.approx(0.125)
    assert rows["pruning"].compression_ratio < 0.30
    assert 0.2 < rows["dedup"].compression_ratio < 0.32
    assert rows["dedup+pruning"].compression_ratio < 0.10
    assert rows["dedup+quant"].compression_ratio < 0.06
    for r in rows.values():
        assert r.max_accuracy_drop < 0.06
