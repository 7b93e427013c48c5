"""Duplicate-block detection (paper Sec. 4, Alg. 1) and its baselines.

The proposed method examines each model's blocks in ascending order of their
3rd-quartile magnitude, looks each block up in an L2-LSH index, replaces it
with the group's representative (the first indexed block) when a group exists,
and re-validates model accuracy every ``k`` blocks; when the accuracy drop
exceeds the threshold ``t``, deduplication for that model stops and all
remaining blocks stay distinct (no rollback, matching Sec. 7.3).

Baselines (Sec. 7.3):

* **Mistique exact** — blocks merge only on identical content hash; no
  accuracy risk, least compression.
* **Mistique approximate** — MinHash over the discretized block, write-order
  processing, periodic accuracy checks (per the paper's Table 9/10 setup).
* **Enhanced pairwise** — a naive O(|L|) scan of all distinct blocks per
  query using L2 distance, with magnitude ordering and accuracy checks.

Spark's role: per-block signatures and magnitudes for the proposed method are
computed on executors (`lsh.signature_df`, `magnitude.magnitude_df`) over the
block relation; the index-build control loop is inherently sequential (it
interleaves accuracy checkpoints) and runs on the driver over block metadata,
exactly as netsDB builds it.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, FrozenSet, List, Optional, Tuple

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core.blocks import BLOCK_SCHEMA, BlockKey
from repro.core.lsh import L2LSH, MinHash, exact_hash, l2_distance
from repro.core.magnitude import block_magnitude
from repro.models.zoo import ModelSpec, Workload

TensorBlockRef = Tuple[str, BlockKey]  # (tensor name, position) within a model


@dataclass
class DistinctBlock:
    """One physically-stored block, possibly referenced by many tensors."""

    id: int
    rep_model: str
    tensor_name: str
    position: BlockKey
    values: np.ndarray


@dataclass
class DedupResult:
    """Output of an index build: the distinct-block list L and mapping F_T."""

    workload: str
    method: str
    distinct: List[DistinctBlock]
    # model_id -> (tensor, position) -> distinct block id
    mapping: Dict[str, Dict[TensorBlockRef, int]]
    accuracy_before: Dict[str, float]
    accuracy_after: Dict[str, float]
    stopped: Dict[str, bool]
    build_seconds: float
    n_logical_blocks: int

    def n_distinct(self) -> int:
        return len(self.distinct)

    def owners(self) -> Dict[int, FrozenSet[str]]:
        """distinct id -> set of tensor keys ('model/tensor') that use it."""
        out: Dict[int, set] = {}
        for model_id, f in self.mapping.items():
            for (tname, _pos), did in f.items():
                out.setdefault(did, set()).add(f"{model_id}/{tname}")
        return {k: frozenset(v) for k, v in out.items()}

    def tensor_block_lists(self) -> Dict[str, List[int]]:
        """tensor key -> distinct ids in write (position) order — the page
        packer's input (paper Sec. 5)."""
        out: Dict[str, List[int]] = {}
        for model_id, f in self.mapping.items():
            per_tensor: Dict[str, List[Tuple[BlockKey, int]]] = {}
            for (tname, pos), did in f.items():
                per_tensor.setdefault(tname, []).append((pos, did))
            for tname, lst in per_tensor.items():
                out[f"{model_id}/{tname}"] = [did for _pos, did in sorted(lst)]
        return out

    def accuracy_drop(self) -> Dict[str, float]:
        return {
            m: self.accuracy_before[m] - self.accuracy_after[m]
            for m in self.accuracy_before
        }

    def logical_bytes(self, block_bytes: int) -> Tuple[int, int]:
        """(bytes w/o dedup, bytes w/ dedup) at the logical block size."""
        return self.n_logical_blocks * block_bytes, len(self.distinct) * block_bytes


# ---------------------------------------------------------------------------
# Matchers: the pluggable "idx" of Alg. 1
# ---------------------------------------------------------------------------


class Matcher:
    """Index interface: find a representative for a block, or insert one."""

    def find(self, values: np.ndarray, hint: Optional[str] = None) -> Optional[int]:
        raise NotImplementedError

    def insert(self, values: np.ndarray, distinct_id: int, hint: Optional[str] = None) -> None:
        raise NotImplementedError


class LSHMatcher(Matcher):
    """Proposed: one L2-LSH signature lookup per block. ``hint`` may carry a
    signature precomputed on Spark executors."""

    def __init__(self, lsh: L2LSH):
        self.lsh = lsh
        self._groups: Dict[str, int] = {}

    def _sig(self, values: np.ndarray, hint: Optional[str]) -> str:
        return hint if hint is not None else self.lsh.signature(values)

    def find(self, values, hint=None):
        return self._groups.get(self._sig(values, hint))

    def insert(self, values, distinct_id, hint=None):
        self._groups.setdefault(self._sig(values, hint), distinct_id)


class ExactMatcher(Matcher):
    """Mistique exact dedup: content-hash equality only."""

    def __init__(self):
        self._groups: Dict[str, int] = {}

    def find(self, values, hint=None):
        return self._groups.get(hint if hint is not None else exact_hash(values))

    def insert(self, values, distinct_id, hint=None):
        self._groups.setdefault(hint if hint is not None else exact_hash(values), distinct_id)


class MinHashMatcher(Matcher):
    """Mistique approximate dedup: banded MinHash candidates + Jaccard check.

    Every query pays discretization + ``n_perms`` permutation rounds — the
    overhead the paper measures as 10+ s/block at their scale (Table 9).
    """

    def __init__(self, minhash: MinHash, band: int = 8, jaccard_threshold: float = 0.7):
        self.mh = minhash
        self.band = band
        self.jaccard_threshold = jaccard_threshold
        self._bands: Dict[str, List[Tuple[int, np.ndarray]]] = {}

    def _key(self, sig: np.ndarray) -> str:
        return ",".join(map(str, sig[: self.band].tolist()))

    def find(self, values, hint=None):
        sig = self.mh.minhash(values)
        for did, ref_sig in self._bands.get(self._key(sig), ()):
            if MinHash.jaccard_estimate(sig, ref_sig) >= self.jaccard_threshold:
                return did
        return None

    def insert(self, values, distinct_id, hint=None):
        sig = self.mh.minhash(values)
        self._bands.setdefault(self._key(sig), []).append((distinct_id, sig))


class PairwiseMatcher(Matcher):
    """Enhanced pairwise: naive linear scan of all distinct blocks per query
    (the 'naive indexing scheme using pair-wise comparison', Sec. 7.3)."""

    def __init__(self, distance_threshold: float):
        self.threshold = distance_threshold
        self._list: List[Tuple[int, np.ndarray]] = []

    def find(self, values, hint=None):
        v = np.asarray(values, dtype=np.float64).ravel()
        for did, ref in self._list:
            if l2_distance(v, ref) <= self.threshold:
                return did
        return None

    def insert(self, values, distinct_id, hint=None):
        self._list.append((distinct_id, np.asarray(values, dtype=np.float64).ravel()))


# ---------------------------------------------------------------------------
# Alg. 1 engine
# ---------------------------------------------------------------------------


def _ordered_blocks(
    model: ModelSpec,
    order: str,
    magnitudes: Optional[Dict[Tuple[str, str, int, int], float]] = None,
) -> List[Tuple[TensorBlockRef, np.ndarray]]:
    items = list(model.all_blocks().items())
    if order == "write":
        return sorted(items, key=lambda kv: (kv[0][0], kv[0][1]))
    if order == "magnitude":
        def mag(kv):
            (tname, pos), arr = kv
            if magnitudes is not None:
                return magnitudes[(model.model_id, tname, pos[0], pos[1])]
            return block_magnitude(arr)

        return sorted(items, key=mag)
    raise ValueError(f"unknown order {order!r}")


def run_dedup(
    workload: Workload,
    matcher: Matcher,
    *,
    method: str,
    order: str = "magnitude",
    check_accuracy: bool = True,
    magnitudes: Optional[Dict[Tuple[str, str, int, int], float]] = None,
    hints: Optional[Dict[Tuple[str, str, int, int], str]] = None,
) -> DedupResult:
    """Incrementally build the index over every model (Alg. 1).

    ``magnitudes`` / ``hints`` may carry Spark-precomputed per-block stats
    keyed by (model_id, tensor, block_row, block_col).
    """
    t0 = time.perf_counter()
    distinct: List[DistinctBlock] = []
    mapping: Dict[str, Dict[TensorBlockRef, int]] = {}
    acc_before: Dict[str, float] = {}
    acc_after: Dict[str, float] = {}
    stopped: Dict[str, bool] = {}
    n_total = 0

    def new_distinct(model_id: str, ref: TensorBlockRef, values: np.ndarray) -> int:
        did = len(distinct)
        distinct.append(
            DistinctBlock(
                id=did,
                rep_model=model_id,
                tensor_name=ref[0],
                position=ref[1],
                values=values,
            )
        )
        return did

    for model in workload.models:
        session = workload.evaluator.session(model)
        a0 = session.accuracy() if check_accuracy else 1.0
        acc_before[model.model_id] = a0
        f: Dict[TensorBlockRef, int] = {}
        blocks = _ordered_blocks(model, order, magnitudes)
        n_total += len(blocks)
        stop = False
        i = 0
        k = workload.check_every
        while i < len(blocks):
            batch = blocks[i : i + k]
            for ref, values in batch:
                hint = (
                    hints.get((model.model_id, ref[0], ref[1][0], ref[1][1]))
                    if hints is not None
                    else None
                )
                match = matcher.find(values, hint)
                if match is not None:
                    rep = distinct[match]
                    f[ref] = match
                    if check_accuracy and not np.array_equal(rep.values, values):
                        session.replace(ref[0], ref[1], rep.values)
                else:
                    did = new_distinct(model.model_id, ref, values)
                    matcher.insert(values, did, hint)
                    f[ref] = did
            i += len(batch)
            if check_accuracy:
                a = session.accuracy()
                if a0 - a > workload.accuracy_threshold:
                    stop = True
                    break
        if stop:
            # Remaining blocks are NOT replaced; each becomes its own distinct
            # block and joins the index as a (new) group representative when
            # its signature is unseen.
            for ref, values in blocks[i:]:
                hint = (
                    hints.get((model.model_id, ref[0], ref[1][0], ref[1][1]))
                    if hints is not None
                    else None
                )
                did = new_distinct(model.model_id, ref, values)
                if matcher.find(values, hint) is None:
                    matcher.insert(values, did, hint)
                f[ref] = did
        mapping[model.model_id] = f
        stopped[model.model_id] = stop
        if check_accuracy:
            final_session = workload.evaluator.session(model)
            for ref, did in f.items():
                rep = distinct[did]
                if not np.array_equal(rep.values, model.all_blocks()[ref]):
                    final_session.replace(ref[0], ref[1], rep.values)
            acc_after[model.model_id] = final_session.accuracy()
        else:
            acc_after[model.model_id] = acc_before[model.model_id]

    return DedupResult(
        workload=workload.name,
        method=method,
        distinct=distinct,
        mapping=mapping,
        accuracy_before=acc_before,
        accuracy_after=acc_after,
        stopped=stopped,
        build_seconds=time.perf_counter() - t0,
        n_logical_blocks=n_total,
    )


# ---------------------------------------------------------------------------
# The four evaluated methods
# ---------------------------------------------------------------------------

DEFAULT_LSH = dict(n_hashes=24, bucket_width=4.0, seed=7)
DEFAULT_PAIRWISE_THRESHOLD = 0.5


def dedup_proposed(
    workload: Workload,
    spark: Optional[SparkSession] = None,
    *,
    check_accuracy: bool = True,
    lsh: Optional[L2LSH] = None,
) -> DedupResult:
    """Proposed: L2 LSH + magnitude ordering + periodic validation. When a
    SparkSession is given, signatures and magnitudes for all blocks are
    computed distributed (pandas UDFs over the block relation)."""
    dim = next(iter(workload.models[0].all_blocks().values())).size
    lsh = lsh or L2LSH(dim=dim, **DEFAULT_LSH)
    hints = mags = None
    if spark is not None:
        hints, mags = spark_block_stats(spark, workload, lsh)
    return run_dedup(
        workload,
        LSHMatcher(lsh),
        method="proposed-l2lsh",
        order="magnitude",
        check_accuracy=check_accuracy,
        magnitudes=mags,
        hints=hints,
    )


def dedup_mistique_exact(workload: Workload) -> DedupResult:
    """Mistique exact: hash-equality groups; accuracy is untouched so the
    validation loop is skipped (it could never trigger)."""
    return run_dedup(
        workload,
        ExactMatcher(),
        method="mistique-exact",
        order="write",
        check_accuracy=False,
    )


def dedup_mistique_approx(
    workload: Workload, *, check_accuracy: bool = True, minhash: Optional[MinHash] = None
) -> DedupResult:
    """Mistique approximate: MinHash groups in write order (no magnitude
    awareness), with the same periodic accuracy checks (Sec. 7.3 setup)."""
    return run_dedup(
        workload,
        MinHashMatcher(minhash or MinHash()),
        method="mistique-approx",
        order="write",
        check_accuracy=check_accuracy,
    )


def dedup_pairwise(
    workload: Workload,
    *,
    check_accuracy: bool = True,
    threshold: float = DEFAULT_PAIRWISE_THRESHOLD,
    use_magnitude: bool = True,
) -> DedupResult:
    """Enhanced pairwise: linear-scan L2 matching; magnitude ordering and
    accuracy checks applied (the 'enhanced' variant of Sec. 7.3)."""
    return run_dedup(
        workload,
        PairwiseMatcher(threshold),
        method="enhanced-pairwise",
        order="magnitude" if use_magnitude else "write",
        check_accuracy=check_accuracy,
    )


# ---------------------------------------------------------------------------
# Spark-side precomputation and index probe timing
# ---------------------------------------------------------------------------


def workload_block_df(spark: SparkSession, workload: Workload) -> DataFrame:
    """All blocks of all models as one Spark relation (tensor_id carries
    'model/tensor')."""
    import pandas as pd

    recs = []
    for model in workload.models:
        for (tname, pos), arr in model.all_blocks().items():
            recs.append(
                {
                    "tensor_id": f"{model.model_id}/{tname}",
                    "block_row": pos[0],
                    "block_col": pos[1],
                    "nrows": arr.shape[0],
                    "ncols": arr.shape[1],
                    "values": arr.ravel().tolist(),
                }
            )
    return spark.createDataFrame(pd.DataFrame.from_records(recs), schema=BLOCK_SCHEMA)


def spark_block_stats(
    spark: SparkSession, workload: Workload, lsh: L2LSH
) -> Tuple[Dict, Dict]:
    """Distributed LSH signatures + magnitudes for every block.

    Returns (hints, magnitudes) keyed by (model_id, tensor, row, col).
    """
    from repro.core.lsh import signature_df
    from repro.core.magnitude import magnitude_df

    df = workload_block_df(spark, workload)
    sigs = signature_df(df, lsh).toPandas()
    mags = magnitude_df(df).toPandas()
    hints = {}
    for row in sigs.itertuples():
        model_id, tname = row.tensor_id.split("/", 1)
        hints[(model_id, tname, int(row.block_row), int(row.block_col))] = row.signature
    magd = {}
    for row in mags.itertuples():
        model_id, tname = row.tensor_id.split("/", 1)
        magd[(model_id, tname, int(row.block_row), int(row.block_col))] = float(row.magnitude)
    return hints, magd


def measure_query_seconds_per_block(
    matcher: Matcher, blocks: List[np.ndarray], n_probe: int = 64, seed: int = 0
) -> float:
    """Average latency of one index lookup (Table 9's 'Query Time' column),
    probed against a built index with a sample of real blocks."""
    g = np.random.default_rng(seed)
    idx = g.integers(0, len(blocks), size=min(n_probe, len(blocks)))
    t0 = time.perf_counter()
    for i in idx:
        matcher.find(blocks[int(i)])
    return (time.perf_counter() - t0) / len(idx)
