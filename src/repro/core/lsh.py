"""Similarity hashing for tensor blocks.

Three families, matching the paper's Sec. 4 and its baselines (Sec. 7.3):

* :class:`L2LSH` — p-stable Euclidean LSH (Datar et al. 2004): each hash is
  ``floor((a . v + b) / w)`` with gaussian ``a`` and uniform ``b``; a signature
  is the tuple of K hashes and two blocks are candidate duplicates iff their
  signatures collide. This is the paper's proposed index key.
* :class:`MinHash` — Mistique-style approximate dedup: block values are first
  discretized (quantized to a fixed number of decimals), the block becomes a
  set of (position, quantized value) items, and a MinHash signature is computed
  with P random permutations. Deliberately the expensive baseline (Table 9).
* :func:`exact_hash` — Mistique exact dedup: a content hash over raw bytes.

All hashers are deterministic in their seed, and each has a Spark entry point
that computes signatures for a whole block relation with a pandas UDF.
"""
from __future__ import annotations

import hashlib
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

_SIG_SCHEMA = T.StructType(
    [
        T.StructField("tensor_id", T.StringType(), False),
        T.StructField("block_row", T.IntegerType(), False),
        T.StructField("block_col", T.IntegerType(), False),
        T.StructField("signature", T.StringType(), False),
    ]
)


class L2LSH:
    """Euclidean-distance LSH over fixed-dimension block vectors.

    ``bucket_width`` (w) controls collision tolerance: two vectors at L2
    distance d collide on one hash with probability that decays in d/w, so a
    signature of ``n_hashes`` concatenated hashes collides only for genuinely
    close blocks. The paper picks L2 LSH because it is cheap to evaluate (one
    matrix-vector product) and relates to the JS-divergence of weight
    distributions.
    """

    def __init__(self, dim: int, n_hashes: int = 8, bucket_width: float = 1.0, seed: int = 7):
        if dim <= 0 or n_hashes <= 0 or bucket_width <= 0:
            raise ValueError("dim, n_hashes, bucket_width must be positive")
        g = np.random.default_rng(seed)
        self.dim = dim
        self.n_hashes = n_hashes
        self.w = float(bucket_width)
        self.a = g.normal(size=(n_hashes, dim))
        self.b = g.uniform(0, self.w, size=n_hashes)

    def signature(self, v: np.ndarray) -> str:
        v = np.asarray(v, dtype=np.float64).ravel()
        if v.size != self.dim:
            raise ValueError(f"expected dim {self.dim}, got {v.size}")
        h = np.floor((self.a @ v + self.b) / self.w).astype(np.int64)
        return ",".join(map(str, h.tolist()))

    def signatures(self, m: np.ndarray) -> list[str]:
        """Vectorized signatures for a (n_blocks x dim) matrix."""
        m = np.asarray(m, dtype=np.float64)
        h = np.floor((m @ self.a.T + self.b) / self.w).astype(np.int64)
        return [",".join(map(str, row.tolist())) for row in h]


class MinHash:
    """MinHash over the discretized block (the Mistique-approx baseline).

    Discretization rounds each value to ``decimals``; the block's item set is
    {(i, round(v_i))}. Each of ``n_perms`` permutations is a universal hash
    ``(a * fp + b) mod p`` over item fingerprints; the signature is the tuple
    of per-permutation minima. The discretization pass plus the many
    permutation rounds are what make this baseline an order of magnitude
    slower per query than the one-matvec L2 LSH (paper Table 9).
    """

    _P = (1 << 31) - 1  # Mersenne prime; a*fp < 2^62 stays in int64

    def __init__(self, n_perms: int = 128, decimals: int = 2, seed: int = 11):
        if n_perms <= 0:
            raise ValueError("n_perms must be positive")
        g = np.random.default_rng(seed)
        self.n_perms = n_perms
        self.decimals = decimals
        self.coef_a = g.integers(1, self._P, size=n_perms, dtype=np.int64)
        self.coef_b = g.integers(0, self._P, size=n_perms, dtype=np.int64)

    def _item_fingerprints(self, v: np.ndarray) -> np.ndarray:
        q = np.round(np.asarray(v, dtype=np.float64).ravel(), self.decimals)
        idx = np.arange(q.size, dtype=np.int64)
        qi = (q * 10**self.decimals).astype(np.int64)
        # Fingerprint each (index, quantized value) item; stable across runs.
        fp = (idx * np.int64(1_000_003)) ^ (qi * np.int64(2_654_435_761))
        return np.abs(fp) % self._P

    def minhash(self, v: np.ndarray) -> np.ndarray:
        """Full n_perms signature vector (one permutation round per entry)."""
        fp = self._item_fingerprints(v)
        mins = np.empty(self.n_perms, dtype=np.int64)
        # Deliberately one permutation per round, as in the system the paper
        # benchmarks — this loop *is* the measured overhead of the baseline.
        for j in range(self.n_perms):
            mins[j] = ((self.coef_a[j] * fp + self.coef_b[j]) % self._P).min()
        return mins

    def signature(self, v: np.ndarray, band: int | None = None) -> str:
        """String key over the first ``band`` permutations (default: all)."""
        mins = self.minhash(v)
        if band is not None:
            mins = mins[:band]
        return ",".join(map(str, mins.tolist()))

    @staticmethod
    def jaccard_estimate(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
        return float((sig_a == sig_b).mean())


def exact_hash(v: np.ndarray) -> str:
    """Content hash of the raw block bytes (Mistique exact dedup)."""
    a = np.ascontiguousarray(np.asarray(v, dtype=np.float64).ravel())
    return hashlib.sha1(a.tobytes()).hexdigest()


def l2_distance(a: np.ndarray, b: np.ndarray) -> float:
    return float(np.linalg.norm(np.asarray(a, dtype=np.float64).ravel() - np.asarray(b, dtype=np.float64).ravel()))


def signature_df(block_df: DataFrame, lsh: L2LSH) -> DataFrame:
    """L2-LSH signatures for a whole block relation, computed on executors."""
    a, b, w = lsh.a, lsh.b, lsh.w

    def _sig(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            m = np.stack([np.asarray(v, dtype=np.float64) for v in pdf["values"]])
            h = np.floor((m @ a.T + b) / w).astype(np.int64)
            yield pd.DataFrame(
                {
                    "tensor_id": pdf["tensor_id"],
                    "block_row": pdf["block_row"],
                    "block_col": pdf["block_col"],
                    "signature": [",".join(map(str, row.tolist())) for row in h],
                }
            )

    return block_df.mapInPandas(_sig, schema=_SIG_SCHEMA)


def exact_hash_df(block_df: DataFrame) -> DataFrame:
    """Content hashes for a whole block relation (exact-dedup baseline)."""

    def _sig(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            yield pd.DataFrame(
                {
                    "tensor_id": pdf["tensor_id"],
                    "block_row": pdf["block_row"],
                    "block_col": pdf["block_col"],
                    "signature": [exact_hash(np.asarray(v)) for v in pdf["values"]],
                }
            )

    return block_df.mapInPandas(_sig, schema=_SIG_SCHEMA)
