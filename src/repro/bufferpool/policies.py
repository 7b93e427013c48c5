"""Page replacement policies (paper Sec. 6 and the Sec. 7.5 baselines).

Classic page-level policies: LRU, MRU, LFU.

Locality-set policies: every page belongs to a locality set (pages processed
similarly — a model's weight pages, the shared weight pages, the input set,
per-model join-hashmap and intermediate sets). When eviction is needed the
policy picks the *victim set* whose next-to-evict page has the lowest
expected eviction cost

    cost = c_w + p_reuse * c_r                      (Eq. 6)

and evicts that set's next page under the set's own order (MRU or LRU).
``c_w`` is nonzero only for dirty durable pages; ``c_r`` is the page reload
cost.

* ``LocalitySetPolicy`` (the existing-work baseline [18,73,74]): estimates
  ``p_reuse`` from each set's *empirically measured* access rate over a
  sliding window — with no attribution to models, so a set that just went
  dead (last model's hashmap) looks hot until the window ages out, and a
  page shared by many models looks no more valuable than a private one.
* ``OptimizedPolicy`` (the paper's contribution): models page accesses as
  per-model Poisson processes and computes

      p_reuse = 1 - exp(-sum_{m in sharers, m pending} lambda_{m,set} * tau)  (Eq. 7)

  from *declared* per-model access rates — the serving system knows each
  model's fixed access pattern and each page's reference count, so dead
  sets drop to zero instantly and pages shared by more pending models are
  kept preferentially.
"""
from __future__ import annotations

from collections import OrderedDict, deque
from dataclasses import dataclass, field
from math import exp
from typing import Deque, Dict, FrozenSet, Optional


@dataclass(frozen=True)
class PageMeta:
    """Metadata the pool and policies need about one page."""

    page_id: str
    nbytes: int
    locality_set: str
    sharers: FrozenSet[str]  # model ids that reference the page
    durable: bool = True  # weights/inputs persist; hashmaps/intermediates don't


class Policy:
    """Interface: observe accesses, pick one victim page id."""

    name = "abstract"

    def on_access(self, page: PageMeta, model: str, tick: int) -> None:  # noqa: D401
        pass

    def on_evict(self, page: PageMeta) -> None:
        pass

    def victim(self, resident: "OrderedDict[str, PageMeta]", dirty: Dict[str, bool]) -> str:
        raise NotImplementedError


class LRUPolicy(Policy):
    name = "LRU"

    def __init__(self):
        self._last: Dict[str, int] = {}

    def on_access(self, page, model, tick):
        self._last[page.page_id] = tick

    def on_evict(self, page):
        self._last.pop(page.page_id, None)

    def victim(self, resident, dirty):
        return min(resident, key=lambda pid: self._last.get(pid, -1))


class MRUPolicy(LRUPolicy):
    name = "MRU"

    def victim(self, resident, dirty):
        return max(resident, key=lambda pid: self._last.get(pid, -1))


class LFUPolicy(Policy):
    name = "LFU"

    def __init__(self):
        self._freq: Dict[str, int] = {}

    def on_access(self, page, model, tick):
        self._freq[page.page_id] = self._freq.get(page.page_id, 0) + 1

    def on_evict(self, page):
        self._freq.pop(page.page_id, None)

    def victim(self, resident, dirty):
        return min(resident, key=lambda pid: self._freq.get(pid, 0))


@dataclass
class _SetState:
    pages: "OrderedDict[str, int]" = field(default_factory=OrderedDict)  # pid -> last tick
    window: Deque[int] = field(default_factory=deque)  # recent access ticks


class LocalitySetPolicy(Policy):
    """Baseline locality-set policy: per-set queues, empirical window rates."""

    def __init__(self, intra: str = "lru", window: int = 1000, horizon: float = 400.0,
                 read_cost: float = 1.0, write_cost: float = 1.0):
        if intra not in ("lru", "mru"):
            raise ValueError("intra must be 'lru' or 'mru'")
        self.intra = intra
        self.window = window
        self.horizon = horizon
        self.read_cost = read_cost
        self.write_cost = write_cost
        self._sets: Dict[str, _SetState] = {}
        self._meta: Dict[str, PageMeta] = {}
        self.name = f"LocalitySet-{'M' if intra == 'mru' else 'L'}"

    # -- bookkeeping ---------------------------------------------------------

    def on_access(self, page, model, tick):
        st = self._sets.setdefault(page.locality_set, _SetState())
        st.pages.pop(page.page_id, None)
        st.pages[page.page_id] = tick
        st.window.append(tick)
        while len(st.window) > self.window:
            st.window.popleft()
        self._meta[page.page_id] = page

    def on_evict(self, page):
        st = self._sets.get(page.locality_set)
        if st:
            st.pages.pop(page.page_id, None)
        self._meta.pop(page.page_id, None)

    def _next_victim_of(self, st: _SetState, resident) -> Optional[str]:
        order = reversed(st.pages) if self.intra == "mru" else iter(st.pages)
        for pid in order:
            if pid in resident:
                return pid
        return None

    # -- p_reuse models ------------------------------------------------------

    def _p_reuse(self, set_id: str, pid: str, st: _SetState, now: int) -> float:
        if not st.window:
            return 0.0
        span = max(now - st.window[0], 1)
        per_page = max(len(st.pages), 1)
        rate = len(st.window) / span / per_page  # accesses/tick/page in the set
        return 1.0 - exp(-rate * self.horizon)

    # -- victim selection ----------------------------------------------------

    def victim(self, resident, dirty):
        best_pid, best_cost = None, None
        now = max((t for st in self._sets.values() for t in (st.window[-1],) if st.window), default=0)
        for set_id, st in self._sets.items():
            pid = self._next_victim_of(st, resident)
            if pid is None:
                continue
            meta = self._meta[pid]
            c_w = self.write_cost if (dirty.get(pid) and meta.durable) else 0.0
            cost = c_w + self._p_reuse(set_id, pid, st, now) * self.read_cost
            if best_cost is None or cost < best_cost:
                best_pid, best_cost = pid, cost
        if best_pid is None:  # pages unseen by policy (shouldn't happen)
            best_pid = next(iter(resident))
        return best_pid


class OptimizedPolicy(LocalitySetPolicy):
    """Paper's policy: Eq. 7 p_reuse from declared per-model rates + sharing.

    The serving simulator keeps ``rates[(model, set_id)]`` up to date (active
    model's working sets get their true access rates; finished models' rates
    drop to zero) and ``pending`` as the models still to be served in the
    round. A page's p_reuse sums the rates of every pending sharer — shared
    pages get kept, dead sets get dropped immediately.
    """

    def __init__(self, intra: str = "lru", horizon: float = 1.0,
                 read_cost: float = 1.0, write_cost: float = 1.0):
        super().__init__(intra=intra, horizon=horizon, read_cost=read_cost, write_cost=write_cost)
        self.rates: Dict[tuple, float] = {}  # (model, set_id) -> lambda
        self.pending: set = set()
        self.name = f"Optimized-{'M' if intra == 'mru' else 'L'}"

    def declare(self, rates: Dict[tuple, float], pending: set) -> None:
        self.rates = dict(rates)
        self.pending = set(pending)

    def _p_reuse(self, set_id: str, pid: str, st: _SetState, now: int) -> float:
        meta = self._meta[pid]
        lam = 0.0
        for m in meta.sharers:
            if m in self.pending:
                lam += self.rates.get((m, set_id), 0.0)
        return 1.0 - exp(-lam * self.horizon)


def make_policy(name: str, read_cost: float = 1.0, write_cost: float = 1.0) -> Policy:
    """Factory for the Sec. 7.5 policy lineup."""
    if name == "LRU":
        return LRUPolicy()
    if name == "MRU":
        return MRUPolicy()
    if name == "LFU":
        return LFUPolicy()
    if name == "LocalitySet-L":
        return LocalitySetPolicy(intra="lru", read_cost=read_cost, write_cost=write_cost)
    if name == "LocalitySet-M":
        return LocalitySetPolicy(intra="mru", read_cost=read_cost, write_cost=write_cost)
    if name == "Optimized-L":
        return OptimizedPolicy(intra="lru", read_cost=read_cost, write_cost=write_cost)
    if name == "Optimized-M":
        return OptimizedPolicy(intra="mru", read_cost=read_cost, write_cost=write_cost)
    raise ValueError(f"unknown policy {name!r}")


POLICY_NAMES = ["LRU", "MRU", "LFU", "LocalitySet-L", "LocalitySet-M", "Optimized-L", "Optimized-M"]
