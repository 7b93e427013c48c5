"""End-to-end serving simulator (netsDB side of Tables 1, 2, 6, 7).

Given a page store (with or without dedup), a serving profile and a
buffer-pool configuration, replays the serving trace through the pool and
reports total latency = kernel compute + page I/O + per-access CPU.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence

from repro.bufferpool.policies import OptimizedPolicy, make_policy
from repro.bufferpool.pool import BufferPool
from repro.models.zoo import ServingProfile, Workload
from repro.paging.packing import PackingResult, pack_baseline, pack_two_stage
from repro.serving.workload import ServingTrace, build_serving_trace, no_dedup_tensor_blocks
from repro.storage.costmodel import DISKS, compute_seconds
from repro.storage.pagestore import PageStore


@dataclass
class ServingReport:
    config: str
    n_models: int
    latency_seconds: float
    compute_seconds: float
    io_seconds: float
    hit_ratio: float
    misses: int
    storage_bytes: int

    def row(self) -> Dict:
        return {
            "config": self.config,
            "models": self.n_models,
            "latency_s": round(self.latency_seconds, 1),
            "compute_s": round(self.compute_seconds, 1),
            "io_s": round(self.io_seconds, 1),
            "hit_ratio": round(self.hit_ratio, 3),
            "misses": self.misses,
        }


def store_for(
    workload: Workload,
    model_ids: Sequence[str],
    dedup_result=None,
    page_bytes: int = 64 * 2**20,
) -> PageStore:
    """Build the page store for a subset of models, deduplicated or not."""
    if dedup_result is None:
        tb = no_dedup_tensor_blocks(workload)
        tb = {k: v for k, v in tb.items() if k.split("/", 1)[0] in set(model_ids)}
        packing = pack_baseline(tb, workload.blocks_per_page)
    else:
        tb = dedup_result.tensor_block_lists()
        tb = {k: v for k, v in tb.items() if k.split("/", 1)[0] in set(model_ids)}
        packing = pack_two_stage(tb, workload.blocks_per_page)
    return PageStore.from_packing(packing, tb, page_bytes)


def simulate_serving(
    store: PageStore,
    profile: ServingProfile,
    model_ids: Sequence[str],
    *,
    disk: str,
    pool_bytes: int,
    policy: str,
    config_name: str = "",
    seed: int = 0,
) -> ServingReport:
    """Replay one serving round (a batch of inferences on every model)."""
    disk_profile = DISKS[disk]
    page_bytes = store.page_bytes
    pol = make_policy(
        policy,
        read_cost=disk_profile.read_seconds(page_bytes),
        write_cost=disk_profile.write_seconds(page_bytes),
    )
    pool = BufferPool(pool_bytes, pol, disk_profile)
    trace: ServingTrace = build_serving_trace(store, profile, model_ids, page_bytes, seed=seed)
    pool.preload_disk(trace.preload)

    for ev in trace.events:
        if ev.kind == "access":
            pool.access(ev.page, ev.model, write=ev.write)
        elif ev.kind == "drop_set":
            pool.drop_set(ev.set_id)
        elif ev.kind == "declare" and isinstance(pol, OptimizedPolicy):
            pol.declare(ev.rates, ev.pending)

    comp = len(model_ids) * compute_seconds(profile.flops_per_model, profile.compute_gflops)
    stats = pool.stats
    return ServingReport(
        config=config_name,
        n_models=len(model_ids),
        latency_seconds=comp + stats.io_seconds + stats.cpu_seconds,
        compute_seconds=comp,
        io_seconds=stats.io_seconds,
        hit_ratio=stats.hit_ratio,
        misses=stats.misses,
        storage_bytes=store.total_bytes(),
    )


def serving_grid(
    workload: Workload,
    dedup_result,
    *,
    model_counts: Sequence[int],
    disks: Sequence[str],
    pool_bytes: int,
    policies: Dict[str, str] | None = None,
) -> List[ServingReport]:
    """The Table-1 sweep: #models x disk x {no-dedup, dedup+optimized}."""
    policies = policies or {"w/o dedup": "LocalitySet-L", "w/ dedup & optimized caching": "Optimized-L"}
    out: List[ServingReport] = []
    for n in model_counts:
        ids = [m.model_id for m in workload.models[:n]]
        for disk in disks:
            for label, policy in policies.items():
                dedup = None if label.startswith("w/o") else dedup_result
                store = store_for(workload, ids, dedup)
                rep = simulate_serving(
                    store,
                    workload.serving_profile,
                    ids,
                    disk=disk,
                    pool_bytes=pool_bytes,
                    policy=policy,
                    config_name=f"{disk}/{label}",
                )
                out.append(rep)
    return out
