"""Tensor-block relational representation.

Following TRA (Yuan et al.) and the paper's Sec. 2/3, a tensor is stored as a
relation of fixed-shape blocks. The canonical Spark schema is::

    tensor_id:  string   -- which tensor (e.g. "model1/embedding")
    block_row:  int      -- block index along dim 0
    block_col:  int      -- block index along dim 1
    nrows:      int      -- rows in this block (edge blocks may be smaller)
    ncols:      int      -- cols in this block
    values:     array<double>  -- row-major flattened payload

Driver-side helpers mirror the same blocking in numpy for the parts of the
pipeline that are inherently sequential (Alg. 1's accuracy-checkpointed index
build) or tiny (packing inner loops over block *metadata*).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Iterator, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

BLOCK_SCHEMA = T.StructType(
    [
        T.StructField("tensor_id", T.StringType(), False),
        T.StructField("block_row", T.IntegerType(), False),
        T.StructField("block_col", T.IntegerType(), False),
        T.StructField("nrows", T.IntegerType(), False),
        T.StructField("ncols", T.IntegerType(), False),
        T.StructField("values", T.ArrayType(T.DoubleType(), False), False),
    ]
)

COO_SCHEMA = T.StructType(
    [
        T.StructField("i", T.LongType(), False),
        T.StructField("j", T.LongType(), False),
        T.StructField("v", T.DoubleType(), False),
    ]
)

BlockKey = Tuple[int, int]  # (block_row, block_col)


def blockify(matrix: np.ndarray, block_shape: Tuple[int, int]) -> Dict[BlockKey, np.ndarray]:
    """Split a 2-D matrix into a dict of (block_row, block_col) -> block array.

    Edge blocks keep their (smaller) natural shape, like TRA's ``tile``.
    """
    if matrix.ndim != 2:
        raise ValueError(f"expected 2-D matrix, got shape {matrix.shape}")
    br, bc = block_shape
    if br <= 0 or bc <= 0:
        raise ValueError(f"block shape must be positive, got {block_shape}")
    out: Dict[BlockKey, np.ndarray] = {}
    n, m = matrix.shape
    for r0 in range(0, n, br):
        for c0 in range(0, m, bc):
            out[(r0 // br, c0 // bc)] = np.ascontiguousarray(
                matrix[r0 : r0 + br, c0 : c0 + bc], dtype=np.float64
            )
    return out


def unblockify(blocks: Dict[BlockKey, np.ndarray]) -> np.ndarray:
    """Reassemble a matrix from its block dict (inverse of :func:`blockify`)."""
    if not blocks:
        return np.zeros((0, 0))
    max_r = max(k[0] for k in blocks) + 1
    max_c = max(k[1] for k in blocks) + 1
    rows = []
    for r in range(max_r):
        rows.append(np.hstack([blocks[(r, c)] for c in range(max_c)]))
    return np.vstack(rows)


def blocks_to_pdf(tensor_id: str, blocks: Dict[BlockKey, np.ndarray]) -> pd.DataFrame:
    """Flatten a block dict into a pandas frame with the canonical schema."""
    recs = []
    for (r, c), arr in sorted(blocks.items()):
        recs.append(
            {
                "tensor_id": tensor_id,
                "block_row": r,
                "block_col": c,
                "nrows": arr.shape[0],
                "ncols": arr.shape[1],
                "values": arr.ravel().tolist(),
            }
        )
    return pd.DataFrame.from_records(recs)


def matrix_to_df(
    spark: SparkSession,
    tensor_id: str,
    matrix: np.ndarray,
    block_shape: Tuple[int, int],
) -> DataFrame:
    """Store a numpy matrix as a Spark block relation."""
    return spark.createDataFrame(
        blocks_to_pdf(tensor_id, blockify(matrix, block_shape)), schema=BLOCK_SCHEMA
    )


def df_to_matrix(df: DataFrame) -> np.ndarray:
    """Collect a (single-tensor) block relation back into a dense numpy matrix."""
    pdf = df.toPandas()
    if pdf.empty:
        return np.zeros((0, 0))
    if pdf["tensor_id"].nunique() > 1:
        raise ValueError("df_to_matrix expects blocks of a single tensor")
    blocks = {
        (int(row.block_row), int(row.block_col)): np.asarray(
            row.values, dtype=np.float64
        ).reshape(int(row.nrows), int(row.ncols))
        for row in pdf.itertuples()
    }
    return unblockify(blocks)


def to_coo_df(df: DataFrame) -> DataFrame:
    """Unfold a block relation into (i, j, v) triples for oracle comparison.

    Element coordinates are *global*: blocks are assumed uniform except on the
    trailing edge, so offsets are reconstructed from cumulative block extents
    computed per partition batch (block extents are carried on every row).
    """
    spark = df.sparkSession
    # Global offsets need the max extent per block index; for uniform blocking
    # (all our tensors) the first block's extents are the stride.
    def _unfold(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            frames = []
            for row in pdf.itertuples():
                arr = np.asarray(row.values, dtype=np.float64).reshape(
                    int(row.nrows), int(row.ncols)
                )
                ii, jj = np.nonzero(np.ones_like(arr))
                frames.append(
                    pd.DataFrame(
                        {
                            "i": ii + int(row.block_row) * int(row.stride_r),
                            "j": jj + int(row.block_col) * int(row.stride_c),
                            "v": arr.ravel(),
                        }
                    )
                )
            if frames:
                yield pd.concat(frames, ignore_index=True)

    first = df.limit(1).collect()
    if not first:
        return spark.createDataFrame([], schema=COO_SCHEMA)
    # Stride = extent of interior blocks = max extent observed.
    from pyspark.sql import functions as F

    strides = df.agg(
        F.max("nrows").alias("sr"), F.max("ncols").alias("sc")
    ).collect()[0]
    with_stride = df.withColumn("stride_r", F.lit(int(strides.sr))).withColumn(
        "stride_c", F.lit(int(strides.sc))
    )
    return with_stride.mapInPandas(_unfold, schema=COO_SCHEMA)


@dataclass(frozen=True)
class BlockId:
    """Identifier of a logical tensor block: (tensor, position)."""

    tensor_id: str
    block_row: int
    block_col: int

    @property
    def position(self) -> BlockKey:
        return (self.block_row, self.block_col)


def grid_shape(blocks: Dict[BlockKey, np.ndarray]) -> Tuple[int, int]:
    """(n_block_rows, n_block_cols) of a block dict."""
    if not blocks:
        return (0, 0)
    return (max(k[0] for k in blocks) + 1, max(k[1] for k in blocks) + 1)


def block_ids(tensor_id: str, blocks: Dict[BlockKey, np.ndarray]) -> List[BlockId]:
    return [BlockId(tensor_id, r, c) for (r, c) in sorted(blocks)]
