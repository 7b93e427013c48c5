"""Feed-forward network inference expressed as tensor relational algebra.

Mirrors the paper's Fig. 1: each fully-connected layer is
``activation(X @ W + b)`` where ``@`` is join+aggregate, ``+ b`` is a
column-keyed broadcast join, and the activation is a transform. The word2vec
embedding inference of Sec. 7.1.1 is the single-layer case with identity
activation (a one-hot batch times the embedding matrix).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core import tra
from repro.core.blocks import matrix_to_df


@dataclass
class Layer:
    """One dense layer: weights (d_in x d_out), optional bias (1 x d_out)."""

    weights: DataFrame
    bias: Optional[DataFrame]
    activation: str = "identity"


def dense_forward(x: DataFrame, layer: Layer, out_tensor_id: str) -> DataFrame:
    """activation(x @ W + b) as a relational plan."""
    h = tra.matmul(x, layer.weights, out_tensor_id + "/mm")
    if layer.bias is not None:
        h = tra.add_row_vector(h, layer.bias, out_tensor_id + "/bias")
    if layer.activation == "softmax":
        return tra.softmax_rows(h, out_tensor_id)
    return tra.transform(h, layer.activation, out_tensor_id)


def ffnn_forward(x: DataFrame, layers: Sequence[Layer], out_tensor_id: str) -> DataFrame:
    """Chain dense layers; the whole network is one Catalyst plan."""
    h = x
    for i, layer in enumerate(layers):
        h = dense_forward(h, layer, f"{out_tensor_id}/l{i}")
    return tra.transform(h, "identity", out_tensor_id)


def numpy_ffnn_forward(x: np.ndarray, mats: List[tuple]) -> np.ndarray:
    """Reference implementation used by the oracle tests and by the surrogate
    accuracy evaluator (`core.accuracy`): mats is [(W, b, activation), ...]."""
    h = x
    for w, b, act in mats:
        h = h @ w
        if b is not None:
            h = h + b
        if act == "relu":
            h = np.maximum(h, 0.0)
        elif act == "sigmoid":
            h = 1.0 / (1.0 + np.exp(-h))
        elif act == "tanh":
            h = np.tanh(h)
        elif act == "softmax":
            e = np.exp(h - h.max(axis=1, keepdims=True))
            h = e / e.sum(axis=1, keepdims=True)
        elif act != "identity":
            raise ValueError(f"unknown activation {act}")
    return h


def layers_from_numpy(
    spark: SparkSession,
    prefix: str,
    mats: List[tuple],
    block_shape: tuple,
) -> List[Layer]:
    """Build Spark Layer objects from [(W, b, activation), ...] numpy triples."""
    layers = []
    for i, (w, b, act) in enumerate(mats):
        wdf = matrix_to_df(spark, f"{prefix}/W{i}", w, block_shape)
        bdf = (
            matrix_to_df(spark, f"{prefix}/b{i}", b.reshape(1, -1), (1, block_shape[1]))
            if b is not None
            else None
        )
        layers.append(Layer(weights=wdf, bias=bdf, activation=act))
    return layers
