"""Buffer pool simulator: the storage substrate for serving (paper Sec. 6).

Replays a page-access trace against a fixed-capacity pool with a pluggable
replacement policy, charging disk I/O through a `DiskProfile`:

* read miss  -> read cost (the page is loaded from disk);
* write      -> allocates the page in the pool, marks it dirty (no read);
* eviction   -> write cost if the page is dirty (dirty non-durable pages are
  spilled too — they may be read back later);
* ``drop_set`` frees a locality set with *no* I/O — netsDB truncates dead
  sets (intermediates whose lifetime ended) instead of spilling them. The
  simulator only calls it when the workload semantics say the data is dead.
"""
from __future__ import annotations

from collections import OrderedDict
from dataclasses import dataclass, field
from typing import Dict, Optional

from repro.bufferpool.policies import PageMeta, Policy
from repro.storage.costmodel import DiskProfile, PER_ACCESS_CPU_SECONDS


@dataclass
class PoolStats:
    hits: int = 0
    misses: int = 0
    evictions: int = 0
    dirty_writebacks: int = 0
    read_seconds: float = 0.0
    write_seconds: float = 0.0
    cpu_seconds: float = 0.0

    @property
    def accesses(self) -> int:
        return self.hits + self.misses

    @property
    def hit_ratio(self) -> float:
        return self.hits / self.accesses if self.accesses else 0.0

    @property
    def io_seconds(self) -> float:
        return self.read_seconds + self.write_seconds


class BufferPool:
    """Fixed-capacity page cache with policy-driven eviction."""

    def __init__(self, capacity_bytes: int, policy: Policy, disk: DiskProfile):
        if capacity_bytes <= 0:
            raise ValueError("capacity must be positive")
        self.capacity = capacity_bytes
        self.policy = policy
        self.disk = disk
        self.resident: "OrderedDict[str, PageMeta]" = OrderedDict()
        self.dirty: Dict[str, bool] = {}
        self.used = 0
        self.tick = 0
        self.stats = PoolStats()
        # Pages that exist on disk (written back or pre-loaded); a miss on a
        # page not on disk and not created by a write is a programming error.
        self.on_disk: set = set()

    # -- trace interface -----------------------------------------------------

    def access(self, page: PageMeta, model: str, write: bool = False) -> bool:
        """One page access; returns True on hit. Misses charge read I/O
        unless this is a write (write-allocate)."""
        self.tick += 1
        self.stats.cpu_seconds += PER_ACCESS_CPU_SECONDS
        hit = page.page_id in self.resident
        if hit:
            self.stats.hits += 1
        else:
            self.stats.misses += 1
            if not write:
                if page.page_id not in self.on_disk:
                    raise RuntimeError(
                        f"read of page {page.page_id} that is neither resident nor on disk"
                    )
                self.stats.read_seconds += self.disk.read_seconds(page.nbytes)
            self._admit(page)
        if write:
            self.dirty[page.page_id] = True
        self.policy.on_access(page, model, self.tick)
        self.resident.move_to_end(page.page_id)
        return hit

    def preload_disk(self, page_ids) -> None:
        """Mark pages as existing on disk (persisted tensors, inputs)."""
        self.on_disk.update(page_ids)

    def drop_set(self, locality_set: str) -> None:
        """Free every resident page of a dead locality set without I/O."""
        for pid in [p for p, m in self.resident.items() if m.locality_set == locality_set]:
            meta = self.resident.pop(pid)
            self.used -= meta.nbytes
            self.dirty.pop(pid, None)
            self.policy.on_evict(meta)

    # -- internals -----------------------------------------------------------

    def _admit(self, page: PageMeta) -> None:
        while self.used + page.nbytes > self.capacity and self.resident:
            self._evict_one()
        if self.used + page.nbytes > self.capacity:
            raise RuntimeError("page larger than pool capacity")
        self.resident[page.page_id] = page
        self.used += page.nbytes

    def _evict_one(self) -> None:
        victim_id = self.policy.victim(self.resident, self.dirty)
        meta = self.resident.pop(victim_id)
        self.used -= meta.nbytes
        self.stats.evictions += 1
        if self.dirty.pop(victim_id, False):
            self.stats.dirty_writebacks += 1
            self.stats.write_seconds += self.disk.write_seconds(meta.nbytes)
            self.on_disk.add(victim_id)
        self.policy.on_evict(meta)
