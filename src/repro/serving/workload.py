"""Serving-trace generation: one model inference batch as page accesses.

netsDB executes a model inference as relational operators over page sets
(Sec. 2); at the storage level one serving pass per model looks like:

1. **Build** — scan the model's weight pages once, materializing the join
   HashMap (hashmap pages are written as weight pages stream in);
2. **Probe** — stream the input pages; each input page probes the model's
   hashmap pages (uniformly random page-level pattern);
3. **Output** — write the intermediate/aggregation pages and read them once
   (input to the next operator / final sink);
4. the model's hashmap and intermediate sets die (netsDB truncates dead
   non-durable sets without I/O).

The trace is a list of typed events consumed by the serving simulator; it
also carries the `declare` events that keep the Optimized policy's per-model
rate table current (Sec. 6's "access patterns of each model inference are
fixed").
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence, Tuple

import numpy as np

from repro.bufferpool.policies import PageMeta
from repro.models.zoo import ServingProfile, Workload
from repro.storage.pagestore import PageStore

# Declared per-(model, set) access rates: the serving engine knows that a
# model's hashmap is probed continuously while it is being served, that
# weight pages are scanned once per pending model, and that the shared input
# is re-read by every pending model.
RATE_HASHMAP_ACTIVE = 8.0
RATE_INTERMEDIATE_ACTIVE = 2.0
RATE_WEIGHTS_PENDING = 1.0
RATE_INPUT_PENDING = 1.0


@dataclass
class TraceEvent:
    kind: str  # "access" | "drop_set" | "declare"
    model: str = ""
    page: PageMeta | None = None
    write: bool = False
    set_id: str = ""
    rates: Dict[Tuple[str, str], float] | None = None
    pending: set | None = None


@dataclass
class ServingTrace:
    events: List[TraceEvent]
    pages: Dict[str, PageMeta]
    preload: List[str]  # page ids persisted on disk before serving starts


def no_dedup_tensor_blocks(workload: Workload) -> Dict[str, List[int]]:
    """The undeduplicated layout: every logical block is its own distinct
    block (write order), so each model stores all of its pages privately."""
    out: Dict[str, List[int]] = {}
    nid = 0
    for model in workload.models:
        for tname, blocks in model.tensors.items():
            ids = []
            for _pos in sorted(blocks):
                ids.append(nid)
                nid += 1
            out[f"{model.model_id}/{tname}"] = ids
    return out


def model_weight_pages(store: PageStore, model_id: str) -> Dict[str, PageMeta]:
    """PageMeta for every page any of the model's tensors reference."""
    pages: Dict[str, PageMeta] = {}
    for tensor_key in store.tensors():
        if not tensor_key.startswith(model_id + "/"):
            continue
        for pid, page in store.pages_of(tensor_key).items():
            if pid in store.shared:
                sharers = frozenset(o.split("/", 1)[0] for o in store.shared_owners[pid])
                locality = "weights/shared"
            else:
                sharers = frozenset({model_id})
                locality = f"weights/{model_id}"
            pages[pid] = PageMeta(pid, page.nbytes, locality, sharers, durable=True)
    return pages


def build_serving_trace(
    store: PageStore,
    profile: ServingProfile,
    model_ids: Sequence[str],
    page_bytes: int,
    seed: int = 0,
) -> ServingTrace:
    """Sequential serving of one inference batch on every model."""
    g = np.random.default_rng(seed)
    pages: Dict[str, PageMeta] = {}
    events: List[TraceEvent] = []
    preload: List[str] = []

    weight_pages = {m: model_weight_pages(store, m) for m in model_ids}
    for m in model_ids:
        pages.update(weight_pages[m])
        preload.extend(weight_pages[m])

    n_input = max(1, profile.input_bytes_per_model // page_bytes)
    input_sharers = frozenset(model_ids) if profile.input_shared else None
    input_pages: Dict[str, List[PageMeta]] = {}
    if profile.input_shared:
        shared_inputs = [
            PageMeta(f"input/{i}", page_bytes, "input", input_sharers, durable=True)
            for i in range(n_input)
        ]
        for m in model_ids:
            input_pages[m] = shared_inputs
    else:
        for m in model_ids:
            input_pages[m] = [
                PageMeta(f"input/{m}/{i}", page_bytes, f"input/{m}", frozenset({m}), durable=True)
                for i in range(n_input)
            ]
    for plist in input_pages.values():
        for p in plist:
            pages[p.page_id] = p
            preload.append(p.page_id)

    hashmap_pages: Dict[str, List[PageMeta]] = {}
    inter_pages: Dict[str, List[PageMeta]] = {}
    for m in model_ids:
        logical_weight_bytes = len(weight_pages[m]) * page_bytes
        n_hm = max(1, int(round(logical_weight_bytes * profile.hashmap_ratio / page_bytes)))
        hashmap_pages[m] = [
            PageMeta(f"hashmap/{m}/{i}", page_bytes, f"hashmap/{m}", frozenset({m}), durable=False)
            for i in range(n_hm)
        ]
        n_int = max(1, profile.intermediate_bytes_per_model // page_bytes)
        inter_pages[m] = [
            PageMeta(f"inter/{m}/{i}", page_bytes, f"inter/{m}", frozenset({m}), durable=False)
            for i in range(n_int)
        ]
        for p in hashmap_pages[m] + inter_pages[m]:
            pages[p.page_id] = p

    pending = list(model_ids)
    for m in model_ids:
        # Declare current rates for the Optimized policy.
        rates: Dict[Tuple[str, str], float] = {}
        for pm in pending:
            rates[(pm, "weights/shared")] = RATE_WEIGHTS_PENDING
            rates[(pm, f"weights/{pm}")] = RATE_WEIGHTS_PENDING
            rates[(pm, "input")] = RATE_INPUT_PENDING
            rates[(pm, f"input/{pm}")] = RATE_INPUT_PENDING
        rates[(m, f"hashmap/{m}")] = RATE_HASHMAP_ACTIVE
        rates[(m, f"inter/{m}")] = RATE_INTERMEDIATE_ACTIVE
        events.append(TraceEvent("declare", rates=rates, pending=set(pending)))

        # Build: scan weight pages (shared first — netsDB scans the shared
        # set then the private array), interleaving hashmap writes.
        wlist = sorted(
            weight_pages[m].values(), key=lambda p: (p.locality_set != "weights/shared", p.page_id)
        )
        hms = hashmap_pages[m]
        hm_written = 0
        for i, wp in enumerate(wlist):
            events.append(TraceEvent("access", model=m, page=wp))
            target = int(round((i + 1) / len(wlist) * len(hms)))
            while hm_written < target:
                events.append(TraceEvent("access", model=m, page=hms[hm_written], write=True))
                hm_written += 1
        while hm_written < len(hms):
            events.append(TraceEvent("access", model=m, page=hms[hm_written], write=True))
            hm_written += 1

        # Probe: stream input; each input page's tuples probe a contiguous
        # run of hashmap pages, advancing cyclically — at the page level the
        # probe phase is a wrap-around scan of the hashmap set (the access
        # pattern of a partitioned hash join's probe side).
        n_probe = max(1, int(round(profile.probe_factor * len(hms))))
        cursor = 0
        for ip in input_pages[m]:
            events.append(TraceEvent("access", model=m, page=ip))
            for _ in range(n_probe):
                events.append(TraceEvent("access", model=m, page=hms[cursor % len(hms)]))
                cursor += 1

        # Output: write intermediates, read them once.
        for op in inter_pages[m]:
            events.append(TraceEvent("access", model=m, page=op, write=True))
        for op in inter_pages[m]:
            events.append(TraceEvent("access", model=m, page=op))

        # The model's non-durable sets are dead now.
        events.append(TraceEvent("drop_set", set_id=f"hashmap/{m}"))
        events.append(TraceEvent("drop_set", set_id=f"inter/{m}"))
        pending.remove(m)

    return ServingTrace(events=events, pages=pages, preload=preload)
