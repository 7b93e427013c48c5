"""One harness per evaluation table (paper Sec. 7) — paper vs. measured.

Every ``tableNN()`` function returns a :class:`TableResult` whose rows carry
the paper's reported numbers next to ours, and ``render()`` produces the
markdown that EXPERIMENTS.md records. ``run_all()`` regenerates everything.

Absolute latencies come from the serving *simulator* over the analytic cost
model (DESIGN.md Sec. 3's substitution), so the comparison targets are
ratios/orderings, not seconds.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from functools import lru_cache
from typing import Dict, List, Optional, Sequence

import numpy as np

from repro.compression import compression_table
from repro.core import dedup_index as DI
from repro.core.lsh import L2LSH, MinHash
from repro.models import zoo
from repro.paging import packing as P
from repro.paging.online import online_packing
from repro.serving import frameworks as FW
from repro.serving.simulator import simulate_serving, store_for
from repro.serving.workload import no_dedup_tensor_blocks

GB = 2**30


@dataclass
class TableResult:
    name: str
    title: str
    headers: List[str]
    rows: List[List]
    notes: str = ""

    def render(self) -> str:
        out = [f"### {self.name}: {self.title}", ""]
        out.append("| " + " | ".join(self.headers) + " |")
        out.append("|" + "|".join(["---"] * len(self.headers)) + "|")
        for row in self.rows:
            out.append("| " + " | ".join(str(c) for c in row) + " |")
        if self.notes:
            out.append("")
            out.append(self.notes)
        return "\n".join(out) + "\n"


# ---------------------------------------------------------------------------
# Shared artifacts (built once per process)
# ---------------------------------------------------------------------------


@lru_cache(maxsize=1)
def artifacts():
    """Workloads + proposed-dedup results used by several tables."""
    textclf = zoo.make_text_classification_workload()
    w2v = zoo.make_word2vec_workload()
    ffnn = zoo.make_ffnn_workload()
    return {
        "textclf": textclf,
        "w2v": w2v,
        "ffnn": ffnn,
        "textclf_dedup": DI.dedup_proposed(textclf),
        "w2v_dedup": DI.dedup_proposed(w2v),
        "ffnn_dedup": DI.dedup_proposed(ffnn),
    }


def _latency(workload, dedup, model_ids, disk, pool_gb, policy) -> float:
    store = store_for(workload, model_ids, dedup)
    rep = simulate_serving(
        store,
        workload.serving_profile,
        model_ids,
        disk=disk,
        pool_bytes=int(pool_gb * GB),
        policy=policy,
    )
    return rep.latency_seconds


# ---------------------------------------------------------------------------
# Table 1 — word2vec latency vs #models (15 GB pool)
# ---------------------------------------------------------------------------

_T1_PAPER = {
    (2, "SSD"): (191, 175),
    (3, "SSD"): (350, 262),
    (4, "SSD"): (506, 381),
    (6, "SSD"): (720, 513),
    (2, "HDD"): (430, 425),
    (3, "HDD"): (1112, 639),
    (4, "HDD"): (1474, 962),
    (6, "HDD"): (2209, 1398),
}


def table01() -> TableResult:
    a = artifacts()
    wl, res = a["w2v"], a["w2v_dedup"]
    rows = []
    for n in (2, 3, 4, 6):
        ids = [m.model_id for m in wl.models[:n]]
        for disk in ("SSD", "HDD"):
            nod = _latency(wl, None, ids, disk, 15, "LRU")
            ded = _latency(wl, res, ids, disk, 15, "Optimized-M")
            p = _T1_PAPER[(n, disk)]
            rows.append([n, disk, p[0], round(nod), p[1], round(ded)])
    return TableResult(
        "Table 1",
        "Word2Vec serving latency vs #models (15 GB buffer pool; seconds)",
        ["models", "disk", "paper w/o dedup", "ours w/o dedup", "paper w/ dedup+opt", "ours w/ dedup+opt"],
        rows,
        "Shape checks: latency grows ~linearly in models; dedup+optimized caching wins everywhere; HDD gains exceed SSD gains.",
    )


# ---------------------------------------------------------------------------
# Table 2 — word2vec, 6 models, pool-size / disk grid
# ---------------------------------------------------------------------------

_T2_PAPER = {
    ("SSD", 15): (720, 513, 513),
    ("SSD", 10): (762, 594, 580),
    ("SSD", 8): (786, 710, 638),
    ("HDD", 15): (2209, 1398, 1398),
    ("HDD", 10): (2264, 1435, 1435),
    ("HDD", 8): (8120, 4921, 1720),
}


def _pool_grid(wl, res, pools, paper, n_models=None) -> List[List]:
    ids = [m.model_id for m in wl.models[: n_models or len(wl.models)]]
    rows = []
    for disk in ("SSD", "HDD"):
        for pool in pools:
            ours = (
                round(_latency(wl, None, ids, disk, pool, "LRU")),
                round(_latency(wl, res, ids, disk, pool, "LRU")),
                round(_latency(wl, res, ids, disk, pool, "Optimized-M")),
            )
            p = paper[(disk, pool)]
            rows.append(
                [disk, f"{pool}GB", p[0], ours[0], p[1], ours[1], p[2], ours[2]]
            )
    return rows


_GRID_HEADERS = [
    "disk",
    "pool",
    "paper w/o",
    "ours w/o",
    "paper w/ dedup",
    "ours w/ dedup",
    "paper w/ dedup+opt",
    "ours w/ dedup+opt",
]


def table02() -> TableResult:
    a = artifacts()
    rows = _pool_grid(a["w2v"], a["w2v_dedup"], (15, 10, 8), _T2_PAPER)
    return TableResult(
        "Table 2",
        "Word2Vec: 6 models under different storage configurations (seconds)",
        _GRID_HEADERS,
        rows,
        "Shape checks: small pools hurt; the HDD/8GB pathology is rescued only by optimized caching.",
    )


# ---------------------------------------------------------------------------
# Table 3 — word2vec: netsDB vs TensorFlow
# ---------------------------------------------------------------------------

W2V_MODEL_BYTES = 4 * GB  # 1M x 500 doubles
W2V_INPUT_BYTES = 800 * 2**20
W2V_FLOPS = 2.0 * 100 * 1_000_000 * 500
W2V_EMB_MODEL_BYTES = 2 * GB  # single precision
W2V_EMB_INPUT_BYTES = 8 * 2**20
W2V_N_IDS = 1_000_000
NETSDB_PER_ID_SECONDS = 3.0e-5


def _netsdb_matmul_latency(n: int) -> float:
    wl = zoo.make_word2vec_workload(n_models=max(n, 2))
    res = DI.dedup_proposed(wl)
    ids = [m.model_id for m in wl.models[:n]]
    return _latency(wl, res, ids, "SSD", 15, "Optimized-M")


def _netsdb_lookup_latency(n: int) -> float:
    """Embedding-lookup serving in netsDB: per-ID index probes plus reading
    the (deduplicated, single-precision) weight pages once."""
    shared_pages, private_pages = 29, 4  # half the double-precision layout
    page_read = 0.5 * (64 * 2**20) / (128 * 2**20)  # 32 MB pages on SSD
    io = (shared_pages + n * private_pages) * page_read
    return n * W2V_N_IDS * NETSDB_PER_ID_SECONDS + io


_T3_PAPER = {
    ("mm", 3): (252, 9, 64, 96, 14, 69, 128),
    ("mm", 6): (503, None, None, None, None, None, None),
    ("mm", 12): (1008, None, None, None, None, None, None),
    ("emb", 3): (114, 57, 58, 58, None, None, None),
    ("emb", 6): (229, None, None, None, None, None, None),
    ("emb", 12): (456, None, None, None, None, None, None),
}


def _cell(x) -> str:
    return "Failed" if x is None else str(round(x))


def table03() -> TableResult:
    rows = []
    for n in (3, 6, 12):
        ours = [round(_netsdb_matmul_latency(n))]
        for fw in (FW.TF_CPU, FW.TF_GPU):
            for src, blobs in (("mem", 0), ("file", 0), ("db", 40_000)):
                r = FW.serve_matmul(
                    fw,
                    n_models=n,
                    model_bytes=W2V_MODEL_BYTES,
                    input_bytes=W2V_INPUT_BYTES,
                    flops_per_model=W2V_FLOPS,
                    source=src,
                    n_blobs=blobs,
                )
                ours.append(r.latency_seconds)
        p = _T3_PAPER[("mm", n)]
        rows.append(
            [f"matmul x{n}"]
            + [f"{_cell(pp)} / {_cell(oo)}" for pp, oo in zip(p, ours)]
        )
    for n in (3, 6, 12):
        ours = [round(_netsdb_lookup_latency(n))]
        for fw in (FW.TF_CPU, FW.TF_GPU):
            for src, blobs in (("mem", 0), ("file", 0), ("db", 1)):
                r = FW.serve_embedding_lookup(
                    fw,
                    n_models=n,
                    model_bytes=W2V_EMB_MODEL_BYTES,
                    input_bytes=W2V_EMB_INPUT_BYTES,
                    n_ids=W2V_N_IDS,
                    source=src,
                    n_blobs=blobs,
                )
                ours.append(r.latency_seconds)
        p = _T3_PAPER[("emb", n)]
        rows.append(
            [f"emb-lookup x{n}"]
            + [f"{_cell(pp)} / {_cell(oo)}" for pp, oo in zip(p, ours)]
        )
    return TableResult(
        "Table 3",
        "Word2Vec: netsDB vs TensorFlow (cells: paper / ours; seconds or Failed)",
        ["workload", "netsDB", "TF-CPU mem", "TF-CPU file", "TF-CPU DB", "TF-GPU mem", "TF-GPU file", "TF-GPU DB"],
        rows,
        "Shape checks: TF is faster per model while everything fits in RAM; TF fails beyond 3 models (and GPU fails for the embedding layer even at 3); netsDB keeps serving at 6 and 12 models with ~linear scaling.",
    )


# ---------------------------------------------------------------------------
# Tables 4 & 5 — text classification pages + accuracy / ref-count distribution
# ---------------------------------------------------------------------------

_T4_PAPER = {
    "textclf-1": (2, 62, 85.01, 85.01),
    "textclf-2": (7, 57, 81.25, 81.25),
    "textclf-3": (1, 63, 84.69, 81.11),
    "textclf-4": (13, 51, 90.38, 86.79),
    "textclf-5": (1, 63, 94.80, 94.09),
}


def _textclf_packing():
    a = artifacts()
    res = a["textclf_dedup"]
    tb = res.tensor_block_lists()
    packed = P.pack_two_stage(tb, a["textclf"].blocks_per_page)
    refs = packed.ref_counts(tb)
    return res, tb, packed, refs


def table04() -> TableResult:
    res, tb, packed, refs = _textclf_packing()
    rows = []
    for m in sorted(res.mapping):
        cover = packed.cover(tb[f"{m}/embedding"])
        private = sum(1 for p in cover if refs[p] == 1)
        shared = sum(1 for p in cover if refs[p] > 1)
        p = _T4_PAPER[m]
        rows.append(
            [
                m,
                p[0], private,
                p[1], shared,
                f"{p[2]:.2f}%", f"{res.accuracy_before[m] * 100:.2f}%",
                f"{p[3]:.2f}%", f"{res.accuracy_after[m] * 100:.2f}%",
            ]
        )
    return TableResult(
        "Table 4",
        "Text classification: pages and accuracy before/after dedup",
        ["model", "paper private", "ours private", "paper shared", "ours shared", "paper acc before", "ours acc before", "paper acc after", "ours acc after"],
        rows,
        "Paper reports AUC; our surrogate metric is plain accuracy on the synthetic validation set. The drop pattern (models 3/4 near the 3.5% threshold, model 5 small, models 1/2 zero) is the target.",
    )


_T5_PAPER = {5: 51, 4: 6, 3: 5, 2: 1, 1: 24}


def table05() -> TableResult:
    res, tb, packed, refs = _textclf_packing()
    per_model: Dict[str, Dict[int, int]] = {}
    for m in sorted(res.mapping):
        cover = packed.cover(tb[f"{m}/embedding"])
        dist: Dict[int, int] = {}
        for p in cover:
            dist[refs[p]] = dist.get(refs[p], 0) + 1
        per_model[m] = dist
    total: Dict[int, int] = {}
    for p, r in refs.items():
        total[r] = total.get(r, 0) + 1
    rows = []
    for rc in (5, 4, 3, 2, 1):
        label = f"pages shared by {rc} models" if rc > 1 else "private pages"
        rows.append(
            [label]
            + [per_model[m].get(rc, 0) for m in sorted(per_model)]
            + [total.get(rc, 0), _T5_PAPER[rc]]
        )
    return TableResult(
        "Table 5",
        "Page reference-count distribution after dedup (two-stage packing)",
        ["", "M1", "M2", "M3", "M4", "M5", "ours total", "paper total"],
        rows,
    )


# ---------------------------------------------------------------------------
# Table 6 — text classification latency grid
# ---------------------------------------------------------------------------

_T6_PAPER = {
    ("SSD", 15): (646, 427, 426),
    ("SSD", 10): (655, 572, 540),
    ("SSD", 8): (675, 595, 557),
    ("HDD", 15): (1675, 1091, 1085),
    ("HDD", 10): (1815, 1515, 1467),
    ("HDD", 8): (1815, 1686, 1620),
}


def table06() -> TableResult:
    a = artifacts()
    rows = _pool_grid(a["textclf"], a["textclf_dedup"], (15, 10, 8), _T6_PAPER)
    return TableResult(
        "Table 6",
        "Text classification: 5 models under different storage configurations (seconds)",
        _GRID_HEADERS,
        rows,
    )


# ---------------------------------------------------------------------------
# Table 7 — FFNN transfer learning latency grid
# ---------------------------------------------------------------------------

_T7_PAPER = {
    ("SSD", 9): (115, 109, 103),
    ("SSD", 13): (114, 96, 96),
    ("HDD", 9): (221, 203, 157),
    ("HDD", 13): (204, 141, 141),
}


def table07() -> TableResult:
    a = artifacts()
    rows = _pool_grid(a["ffnn"], a["ffnn_dedup"], (9, 13), _T7_PAPER)
    return TableResult(
        "Table 7",
        "FFNN transfer learning: 3 models under different storage configurations (seconds)",
        _GRID_HEADERS,
        rows,
        "Our simulated FFNN I/O is costlier than the paper's testbed, so absolute values run higher; the orderings (dedup <= no-dedup, optimized <= dedup, HDD >> SSD, bigger pool helps) are the reproduction target.",
    )


# ---------------------------------------------------------------------------
# Table 8 — FFNN: netsDB vs TensorFlow
# ---------------------------------------------------------------------------

FFNN_MODEL_BYTES = int(4.9 * GB)
FFNN_INPUT_BYTES = int(4.78 * GB)
FFNN_FLOPS = 2.0 * 1000 * (597_540 * 1000 + 14_588 * 1000)

_T8_PAPER = {
    2: (64, 43, 383, 94, 17, 310, 55),
    3: (96, 64, None, 115, None, None, None),
}


def table08() -> TableResult:
    a = artifacts()
    wl, res = a["ffnn"], a["ffnn_dedup"]
    rows = []
    for n in (2, 3):
        ids = [m.model_id for m in wl.models[:n]]
        ours = [round(_latency(wl, res, ids, "SSD", 13, "Optimized-M"))]
        for fw in (FW.TF_CPU_DENSE, FW.TF_GPU):
            for src, blobs in (("mem", 0), ("file", 0), ("db", 1000)):
                r = FW.serve_matmul(
                    fw,
                    n_models=n,
                    model_bytes=FFNN_MODEL_BYTES,
                    input_bytes=FFNN_INPUT_BYTES,
                    flops_per_model=FFNN_FLOPS,
                    source=src,
                    n_blobs=blobs,
                )
                ours.append(r.latency_seconds)
        p = _T8_PAPER[n]
        rows.append(
            [f"{n} models"] + [f"{_cell(pp)} / {_cell(oo)}" for pp, oo in zip(p, ours)]
        )
    return TableResult(
        "Table 8",
        "FFNN: netsDB vs TensorFlow (cells: paper / ours; seconds or Failed)",
        ["config", "netsDB", "TF-CPU mem", "TF-CPU file", "TF-CPU DB", "TF-GPU mem", "TF-GPU file", "TF-GPU DB"],
        rows,
        "Shape checks: netsDB beats TF-file everywhere; TF-file fails at 3 models (CSV parse buffers), TF-GPU fails at 3 models (16 GB); TF-mem stays fastest while it fits.",
    )


# ---------------------------------------------------------------------------
# Tables 9 & 10 — index method comparison
# ---------------------------------------------------------------------------

_T9_PAPER = {
    "mistique-exact": (2545, 2040, 0.02),
    "mistique-approx": (2545, 712, 10.0),
    "enhanced-pairwise": (2545, 693, 2.9),
    "proposed-l2lsh": (2545, 662, 0.2),
}
_T10_PAPER = {
    "mistique-exact": (0.0, 0.0, 0.0, 0.0, 0.0),
    "mistique-approx": (0.0, 0.0, 3.64, 4.06, 0.71),
    "enhanced-pairwise": (0.0, 0.0, 3.57, 3.58, 2.92),
    "proposed-l2lsh": (0.0, 0.0, 3.58, 3.59, 0.71),
}


@lru_cache(maxsize=1)
def _index_methods():
    a = artifacts()
    wl = a["textclf"]
    return {
        "mistique-exact": DI.dedup_mistique_exact(wl),
        "mistique-approx": DI.dedup_mistique_approx(wl),
        "enhanced-pairwise": DI.dedup_pairwise(wl),
        "proposed-l2lsh": a["textclf_dedup"],
    }


def _probe_matcher(method: str, result) -> DI.Matcher:
    dim = zoo.PHYS_BLOCK_VALUES
    if method == "mistique-exact":
        m = DI.ExactMatcher()
    elif method == "mistique-approx":
        m = DI.MinHashMatcher(MinHash(n_perms=384))
    elif method == "enhanced-pairwise":
        m = DI.PairwiseMatcher(DI.DEFAULT_PAIRWISE_THRESHOLD)
    else:
        m = DI.LSHMatcher(L2LSH(dim=dim, **DI.DEFAULT_LSH))
    for d in result.distinct:
        m.insert(d.values, d.id)
    return m


def table09() -> TableResult:
    methods = _index_methods()
    a = artifacts()
    blocks = [v for mm in a["textclf"].models for v in mm.tensors["embedding"].values()]
    rows = []
    for name, res in methods.items():
        matcher = _probe_matcher(name, res)
        q = DI.measure_query_seconds_per_block(matcher, blocks, n_probe=48)
        p = _T9_PAPER[name]
        rows.append(
            [name, p[0], res.n_logical_blocks, p[1], res.n_distinct(), p[2], f"{q * 1e3:.3f} ms"]
        )
    return TableResult(
        "Table 9",
        "Index comparison: compression and per-block query time",
        ["method", "paper blocks w/o dedup", "ours blocks w/o dedup", "paper blocks w/ dedup", "ours blocks w/ dedup", "paper query s/block", "ours query time"],
        rows,
        "Absolute query times shrink with our 2048-value physical blocks; the ordering (exact < proposed << pairwise/minhash) is the target. Paper's MinHash runs on 1M-value blocks, hence its 10+ s.",
    )


def table10() -> TableResult:
    methods = _index_methods()
    rows = []
    for name, res in methods.items():
        drops = res.accuracy_drop()
        p = _T10_PAPER[name]
        rows.append(
            [name]
            + [
                f"{pp:.2f}% / {drops[m] * 100:.2f}%"
                for pp, m in zip(p, sorted(drops))
            ]
        )
    return TableResult(
        "Table 10",
        "Accuracy drop per model per dedup method (cells: paper / ours)",
        ["method", "Model-1", "Model-2", "Model-3", "Model-4", "Model-5"],
        rows,
        "Shape checks: exact dedup never drops; models 1-2 never drop; models 3-4 land near the 3.5% stop threshold for magnitude-aware methods; minhash (no magnitude ordering) overshoots on model 4.",
    )


# ---------------------------------------------------------------------------
# Tables 11 & 12 — packing page counts and latency
# ---------------------------------------------------------------------------

_T11_PAPER = {
    "word2vec (100x10000, 64MB)": (130, 98, 99, 98),
    "text classification (100x10000, 64MB)": (101, 87, 91, 87),
    "text classification (300x300, 64MB)": (156, 104, 108, 109),
    "text classification (300x300, 32MB)": (270, 195, 198, 202),
}
_T12_PAPER = {
    "word2vec (100x10000, 64MB)": (1.29, 0.02, 0.01, 0.82),
    "text classification (100x10000, 64MB)": (0.68, 0.01, 0.01, 0.52),
    "text classification (300x300, 64MB)": (13.65, 0.05, 0.05, 11.50),
    "text classification (300x300, 32MB)": (44.72, 0.04, 0.04, 42.72),
}
_PACK_ORDER = ("baseline", "two-stage", "greedy1", "greedy2")


@lru_cache(maxsize=1)
def _packing_scenarios():
    a = artifacts()
    scen = {}
    scen["word2vec (100x10000, 64MB)"] = (a["w2v_dedup"].tensor_block_lists(), 8)
    scen["text classification (100x10000, 64MB)"] = (
        a["textclf_dedup"].tensor_block_lists(),
        8,
    )
    for mb in (64, 32):
        md = zoo.make_textclf_metadata_300x300(mb * 2**20)
        scen[f"text classification (300x300, {mb}MB)"] = (
            {f"t{k}": v for k, v in md.tensor_blocks.items()},
            md.blocks_per_page,
        )
    return scen


@lru_cache(maxsize=1)
def _packing_results():
    out = {}
    for name, (tb, l) in _packing_scenarios().items():
        out[name] = {
            alg: P.ALGORITHMS[alg](tb, l) for alg in _PACK_ORDER
        }
        for r in out[name].values():
            r.validate(tb)
    return out


def table11() -> TableResult:
    rows = []
    for name, results in _packing_results().items():
        p = _T11_PAPER[name]
        rows.append(
            [name]
            + [
                f"{pp} / {results[alg].n_pages()}"
                for pp, alg in zip(p, _PACK_ORDER)
            ]
        )
    return TableResult(
        "Table 11",
        "Pages required by packing algorithm (cells: paper / ours)",
        ["scenario", "Baseline", "Two-Stage", "Greedy-1", "Greedy-2"],
        rows,
        "Shape checks: Two-Stage <= Greedy-1 and <= Baseline everywhere; Baseline pays ~1.2-1.5x.",
    )


def table12() -> TableResult:
    rows = []
    for name, results in _packing_results().items():
        p = _T12_PAPER[name]
        rows.append(
            [name]
            + [
                f"{pp} / {results[alg].seconds:.3f}"
                for pp, alg in zip(p, _PACK_ORDER)
            ]
        )
    return TableResult(
        "Table 12",
        "Packing latency in seconds (cells: paper / ours)",
        ["scenario", "Baseline", "Two-Stage", "Greedy-1", "Greedy-2"],
        rows,
        "Shape checks: Two-Stage ~ Greedy-1 (fast); Baseline and Greedy-2 are the slow pair, growing with block count (our scale has ~5x fewer blocks than the paper's 300x300 scenarios).",
    )


# ---------------------------------------------------------------------------
# Table 13 — online packing
# ---------------------------------------------------------------------------

_T13_PAPER = [
    (1, 0, 0, 64),
    (2, 52, 11, 15),
    (3, 52, 9, 15),
    (4, 50, 13, 23),
    (5, 52, 13, 16),
]


def table13() -> TableResult:
    a = artifacts()
    tb = a["textclf_dedup"].tensor_block_lists()
    steps = online_packing(tb, a["textclf"].blocks_per_page)
    rows = []
    for p, s in zip(_T13_PAPER, steps):
        rows.append(
            [
                s.step,
                s.tensor_key.split("/")[0],
                f"{p[1]} / {s.pages_reused}",
                f"{p[2]} / {s.pages_discarded}",
                f"{p[3]} / {s.pages_created}",
            ]
        )
    return TableResult(
        "Table 13",
        "Online packing: page reuse per model-add step (cells: paper / ours)",
        ["step", "new model", "pages reused", "pages discarded", "pages created"],
        rows,
        "Shape checks: ~80% of pages are reused at every step after the first.",
    )


# ---------------------------------------------------------------------------
# Table 14 — compression interplay
# ---------------------------------------------------------------------------

_T14_PAPER = {
    "pruning": (3.2, 23.4),
    "quantization": (1.33, 12.5),
    "dedup": (3.98, 27.32),
    "dedup+pruning": (3.6, 6.74),
    "dedup+quant": (3.78, 5.24),
}


def table14() -> TableResult:
    a = artifacts()
    rows = []
    for r in compression_table(a["textclf"]):
        p = _T14_PAPER[r.technique]
        rows.append(
            [
                r.technique,
                f"{p[0]:.2f}%",
                f"{r.max_accuracy_drop * 100:.2f}%",
                f"{p[1]:.2f}%",
                f"{r.compression_ratio * 100:.2f}%",
            ]
        )
    return TableResult(
        "Table 14",
        "Compression techniques: max accuracy drop and compression ratio",
        ["technique", "paper max drop", "ours max drop", "paper ratio", "ours ratio"],
        rows,
        "Compression ratio = size after / size before (smaller is better). Shape checks: dedup composes with pruning/quantization to ~5-7% combined ratio at bounded accuracy cost.",
    )


# ---------------------------------------------------------------------------
# Fig. 8 companion — cache hit ratio by replacement policy (as a table)
# ---------------------------------------------------------------------------

_FIG8_POLICIES = ["LRU", "MRU", "LFU", "LocalitySet-L", "LocalitySet-M", "Optimized-L", "Optimized-M"]


def table_fig8() -> TableResult:
    a = artifacts()
    rows = []
    for key, pool_gb in (("w2v", 8), ("textclf", 8)):
        wl, res = a[key], a[f"{key}_dedup"]
        ids = [m.model_id for m in wl.models]
        for policy in _FIG8_POLICIES:
            store = store_for(wl, ids, res)
            rep = simulate_serving(
                store, wl.serving_profile, ids,
                disk="HDD", pool_bytes=pool_gb * GB, policy=policy,
            )
            rows.append([wl.name, policy, f"{rep.hit_ratio:.3f}", round(rep.latency_seconds)])
    return TableResult(
        "Fig. 8 (as table)",
        "Cache hit ratio by replacement policy (dedup storage, HDD, 8 GB pool)",
        ["workload", "policy", "hit ratio", "latency (s)"],
        rows,
        "Shape checks (paper Fig. 8): Optimized-M/L > LocalitySet-M/L and classic policies; up to ~1.6x hit-ratio improvement.",
    )


ALL_TABLES = {
    "table01": table01,
    "table02": table02,
    "table03": table03,
    "table04": table04,
    "table05": table05,
    "table06": table06,
    "table07": table07,
    "table08": table08,
    "table09": table09,
    "table10": table10,
    "table11": table11,
    "table12": table12,
    "table13": table13,
    "table14": table14,
    "fig8": table_fig8,
}


def run_all(names: Optional[Sequence[str]] = None) -> List[TableResult]:
    picked = names or list(ALL_TABLES)
    return [ALL_TABLES[n]() for n in picked]
