"""Equivalence classes on Spark (paper Sec. 5.3, the parallel divide step).

The class key of a distinct block is the set of tensors that own it. On Spark
this is one shuffle: explode (tensor, block) pairs, group by block, collect
the owner set. Per-class packing then runs as one `applyInPandas` task per
class — the paper's "pack for each equivalent class in parallel".

Blocks within a class are ordered by the same write-order rank the driver
packer uses (`packing.equivalence_classes`): the position of the block in its
first owner's block list. That rank is computed once on the driver (it is
tiny metadata) and carried through the shuffle.
"""
from __future__ import annotations

from typing import Dict, List, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

PAIR_SCHEMA = T.StructType(
    [
        T.StructField("tensor_key", T.StringType(), False),
        T.StructField("block_id", T.LongType(), False),
        T.StructField("rank", T.StringType(), False),
    ]
)

_PACK_SCHEMA = T.StructType(
    [
        T.StructField("owner_key", T.StringType(), False),
        T.StructField("page_seq", T.LongType(), False),
        T.StructField("block_id", T.LongType(), False),
    ]
)


def _ranks(tensor_blocks: Dict[str, Sequence[int]]) -> Dict[int, str]:
    """block -> sortable write-order rank (first owner key + position)."""
    rank: Dict[int, str] = {}
    for k in sorted(tensor_blocks):
        for idx, it in enumerate(tensor_blocks[k]):
            rank.setdefault(it, f"{k}|{idx:09d}")
    return rank


def tensor_blocks_df(spark: SparkSession, tensor_blocks: Dict[str, Sequence[int]]) -> DataFrame:
    rank = _ranks(tensor_blocks)
    recs = [
        {"tensor_key": k, "block_id": int(b), "rank": rank[int(b)]}
        for k, items in tensor_blocks.items()
        for b in set(items)
    ]
    return spark.createDataFrame(pd.DataFrame.from_records(recs), schema=PAIR_SCHEMA)


def equivalence_classes_df(pairs: DataFrame) -> DataFrame:
    """block_id -> sorted owner set key ('t1|t2|...') + write-order rank."""
    return pairs.groupBy("block_id").agg(
        F.concat_ws("|", F.array_sort(F.collect_set("tensor_key"))).alias("owner_key"),
        F.min("rank").alias("rank"),
    )


def pack_classes_spark(
    spark: SparkSession, tensor_blocks: Dict[str, Sequence[int]], l: int
) -> List[tuple]:
    """Stage-1 packing distributed: one task per equivalence class chunks its
    blocks into pages of ``l``. Returns pages as tuples of block ids.

    Equivalent to `packing.pack_greedy1` (tested against it); the cross-class
    repacking of stage 2 stays on the driver — it needs only the non-full
    pages' metadata.
    """
    classes = equivalence_classes_df(tensor_blocks_df(spark, tensor_blocks))

    def _pack(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("rank").reset_index(drop=True)
        pdf["page_seq"] = pdf.index // l
        return pdf[["owner_key", "page_seq", "block_id"]]

    packed = classes.groupBy("owner_key").applyInPandas(_pack, schema=_PACK_SCHEMA)
    pdf = packed.toPandas().sort_values(["owner_key", "page_seq", "block_id"])
    pages = [
        tuple(int(b) for b in grp["block_id"])
        for _key, grp in pdf.groupby(["owner_key", "page_seq"], sort=True)
    ]
    return pages
