"""Tensor relational algebra (TRA) on Spark DataFrames.

Sec. 2.1 of the paper: linear algebra over blocked tensors maps to relational
algebra nested with kernel UDFs —

* matrix multiplication = join (A.block_col == B.block_row) + per-pair kernel
  (block matmul) + group-by (A.block_row, B.block_col) with a sum-reduce kernel;
* matrix addition       = join on (block_row, block_col) + elementwise kernel;
* transpose             = rekey (swap indices, transpose payload);
* relu/tanh/sigmoid     = transform (elementwise map);
* row softmax           = aggregation (per row-block group over column blocks)
                          followed by a transform.

All operators are DataFrame -> DataFrame (Catalyst plans with pandas-UDF
kernels); none drop to RDDs. Every operator is oracle-checked in the tests
against DuckDB SQL over unfolded (i, j, v) triples.
"""
from __future__ import annotations

from typing import Callable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.blocks import BLOCK_SCHEMA

_PAIR_COLS = [
    "tensor_id",
    "block_row",
    "block_col",
    "a_nrows",
    "a_ncols",
    "a_values",
    "b_nrows",
    "b_ncols",
    "b_values",
]


def matmul(a: DataFrame, b: DataFrame, out_tensor_id: str) -> DataFrame:
    """C = A @ B as join + aggregate over blocks (paper Fig. 1).

    The join pairs A-blocks with B-blocks on A.block_col == B.block_row; the
    grouped kernel multiplies each pair and sums partial products per output
    block (A.block_row, B.block_col).
    """
    pairs = (
        a.alias("a")
        .join(b.alias("b"), F.col("a.block_col") == F.col("b.block_row"))
        .select(
            F.lit(out_tensor_id).alias("tensor_id"),
            F.col("a.block_row").alias("block_row"),
            F.col("b.block_col").alias("block_col"),
            F.col("a.nrows").alias("a_nrows"),
            F.col("a.ncols").alias("a_ncols"),
            F.col("a.values").alias("a_values"),
            F.col("b.nrows").alias("b_nrows"),
            F.col("b.ncols").alias("b_ncols"),
            F.col("b.values").alias("b_values"),
        )
    )

    def _mul_reduce(pdf: pd.DataFrame) -> pd.DataFrame:
        acc = None
        for row in pdf.itertuples():
            lhs = np.asarray(row.a_values, dtype=np.float64).reshape(
                int(row.a_nrows), int(row.a_ncols)
            )
            rhs = np.asarray(row.b_values, dtype=np.float64).reshape(
                int(row.b_nrows), int(row.b_ncols)
            )
            prod = lhs @ rhs
            acc = prod if acc is None else acc + prod
        first = pdf.iloc[0]
        return pd.DataFrame(
            {
                "tensor_id": [first.tensor_id],
                "block_row": [int(first.block_row)],
                "block_col": [int(first.block_col)],
                "nrows": [acc.shape[0]],
                "ncols": [acc.shape[1]],
                "values": [acc.ravel().tolist()],
            }
        )

    return pairs.groupBy("tensor_id", "block_row", "block_col").applyInPandas(
        _mul_reduce, schema=BLOCK_SCHEMA
    )


def _elementwise_join(
    a: DataFrame, b: DataFrame, out_tensor_id: str, kernel: Callable[[np.ndarray, np.ndarray], np.ndarray]
) -> DataFrame:
    pairs = (
        a.alias("a")
        .join(
            b.alias("b"),
            (F.col("a.block_row") == F.col("b.block_row"))
            & (F.col("a.block_col") == F.col("b.block_col")),
        )
        .select(
            F.lit(out_tensor_id).alias("tensor_id"),
            F.col("a.block_row").alias("block_row"),
            F.col("a.block_col").alias("block_col"),
            F.col("a.nrows").alias("nrows"),
            F.col("a.ncols").alias("ncols"),
            F.col("a.values").alias("a_values"),
            F.col("b.values").alias("b_values"),
        )
    )

    def _apply(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            vals = [
                kernel(
                    np.asarray(x, dtype=np.float64), np.asarray(y, dtype=np.float64)
                ).tolist()
                for x, y in zip(pdf["a_values"], pdf["b_values"])
            ]
            out = pdf[["tensor_id", "block_row", "block_col", "nrows", "ncols"]].copy()
            out["values"] = vals
            yield out

    return pairs.mapInPandas(_apply, schema=BLOCK_SCHEMA)


def add(a: DataFrame, b: DataFrame, out_tensor_id: str) -> DataFrame:
    """C = A + B: a join on block position with an elementwise-add kernel."""
    return _elementwise_join(a, b, out_tensor_id, lambda x, y: x + y)


def add_row_vector(a: DataFrame, bias: DataFrame, out_tensor_id: str) -> DataFrame:
    """C = A + broadcast(bias): bias is a 1 x m tensor blocked along columns.

    The join key is block_col only — each bias block is reused by every
    block-row of A (the relational form of numpy row-broadcasting).
    """
    pairs = (
        a.alias("a")
        .join(bias.alias("b"), F.col("a.block_col") == F.col("b.block_col"))
        .select(
            F.lit(out_tensor_id).alias("tensor_id"),
            F.col("a.block_row").alias("block_row"),
            F.col("a.block_col").alias("block_col"),
            F.col("a.nrows").alias("nrows"),
            F.col("a.ncols").alias("ncols"),
            F.col("a.values").alias("a_values"),
            F.col("b.values").alias("b_values"),
        )
    )

    def _apply(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            vals = []
            for row in pdf.itertuples():
                lhs = np.asarray(row.a_values, dtype=np.float64).reshape(
                    int(row.nrows), int(row.ncols)
                )
                vals.append((lhs + np.asarray(row.b_values, dtype=np.float64)).ravel().tolist())
            out = pdf[["tensor_id", "block_row", "block_col", "nrows", "ncols"]].copy()
            out["values"] = vals
            yield out

    return pairs.mapInPandas(_apply, schema=BLOCK_SCHEMA)


def transpose(a: DataFrame, out_tensor_id: str) -> DataFrame:
    """A^T as a rekey: swap block indices and transpose each payload."""

    def _t(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            vals = [
                np.asarray(v, dtype=np.float64).reshape(int(r), int(c)).T.ravel().tolist()
                for v, r, c in zip(pdf["values"], pdf["nrows"], pdf["ncols"])
            ]
            out = pd.DataFrame(
                {
                    "tensor_id": pdf["tensor_id"],
                    "block_row": pdf["block_col"],
                    "block_col": pdf["block_row"],
                    "nrows": pdf["ncols"],
                    "ncols": pdf["nrows"],
                    "values": vals,
                }
            )
            yield out

    return (
        a.withColumn("tensor_id", F.lit(out_tensor_id))
        .mapInPandas(_t, schema=BLOCK_SCHEMA)
    )


_ACTIVATIONS: dict[str, Callable[[np.ndarray], np.ndarray]] = {
    "relu": lambda x: np.maximum(x, 0.0),
    "sigmoid": lambda x: 1.0 / (1.0 + np.exp(-x)),
    "tanh": np.tanh,
    "identity": lambda x: x,
}


def transform(a: DataFrame, fn: str, out_tensor_id: str) -> DataFrame:
    """Elementwise activation as a TRA transform (relu / sigmoid / tanh)."""
    kernel = _ACTIVATIONS[fn]

    def _apply(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            out = pdf.copy()
            out["tensor_id"] = out_tensor_id
            out["values"] = [
                kernel(np.asarray(v, dtype=np.float64)).tolist() for v in pdf["values"]
            ]
            yield out

    return a.mapInPandas(_apply, schema=BLOCK_SCHEMA)


def softmax_rows(a: DataFrame, out_tensor_id: str) -> DataFrame:
    """Row-wise softmax: an aggregation over each block-row group followed by a
    transform (the paper's softmax = aggregation + transform)."""

    def _softmax(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("block_col")
        mats = [
            np.asarray(v, dtype=np.float64).reshape(int(r), int(c))
            for v, r, c in zip(pdf["values"], pdf["nrows"], pdf["ncols"])
        ]
        full = np.hstack(mats)
        shifted = full - full.max(axis=1, keepdims=True)
        e = np.exp(shifted)
        sm = e / e.sum(axis=1, keepdims=True)
        out_rows = []
        col0 = 0
        for row, m in zip(pdf.itertuples(), mats):
            c = m.shape[1]
            out_rows.append(
                {
                    "tensor_id": out_tensor_id,
                    "block_row": int(row.block_row),
                    "block_col": int(row.block_col),
                    "nrows": m.shape[0],
                    "ncols": c,
                    "values": sm[:, col0 : col0 + c].ravel().tolist(),
                }
            )
            col0 += c
        return pd.DataFrame.from_records(out_rows)

    return a.groupBy("block_row").applyInPandas(_softmax, schema=BLOCK_SCHEMA)
