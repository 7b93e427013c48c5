"""Block magnitude statistics (paper Sec. 4.3, Step 1).

The index examines blocks in ascending order of an aggregated magnitude value.
The paper uses the 3rd *quartile* sense of "3rd percentile ranking" — the
75th percentile of |w| — because "even if the block contains only a few large
magnitude weights, it may impact the inference accuracy significantly": a
high-quantile statistic surfaces those few large weights where mean/median
would hide them. We expose mean / median / q1 / q3 and default to q3.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

MAGNITUDE_STATS = ("mean", "median", "q1", "q3", "max")


def block_magnitude(values: np.ndarray, stat: str = "q3") -> float:
    """Aggregated |weight| magnitude of one block."""
    a = np.abs(np.asarray(values, dtype=np.float64).ravel())
    if a.size == 0:
        return 0.0
    if stat == "mean":
        return float(a.mean())
    if stat == "median":
        return float(np.percentile(a, 50))
    if stat == "q1":
        return float(np.percentile(a, 25))
    if stat == "q3":
        return float(np.percentile(a, 75))
    if stat == "max":
        return float(a.max())
    raise ValueError(f"unknown magnitude stat {stat!r}; use one of {MAGNITUDE_STATS}")


_MAG_SCHEMA = T.StructType(
    [
        T.StructField("tensor_id", T.StringType(), False),
        T.StructField("block_row", T.IntegerType(), False),
        T.StructField("block_col", T.IntegerType(), False),
        T.StructField("magnitude", T.DoubleType(), False),
    ]
)


def magnitude_df(block_df: DataFrame, stat: str = "q3") -> DataFrame:
    """Per-block magnitude as a Spark relation (heavy numeric work on executors)."""
    if stat not in MAGNITUDE_STATS:
        raise ValueError(f"unknown magnitude stat {stat!r}")

    def _mag(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            yield pd.DataFrame(
                {
                    "tensor_id": pdf["tensor_id"],
                    "block_row": pdf["block_row"],
                    "block_col": pdf["block_col"],
                    "magnitude": [
                        block_magnitude(np.asarray(v, dtype=np.float64), stat)
                        for v in pdf["values"]
                    ],
                }
            )

    return block_df.mapInPandas(_mag, schema=_MAG_SCHEMA)
