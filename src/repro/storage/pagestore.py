"""Physical page sets with sharing (paper Sec. 3).

Each tensor owns an array of *private* pages plus a list of references into a
special *shared* page set. Removing a tensor removes its private pages and
decrements the reference count of each of its shared pages; when a shared
page's count drops to 1, the page migrates into the private set of its sole
remaining owner. An update is remove + insert (serving-time models change
rarely).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, FrozenSet, List, Sequence, Tuple

from repro.paging.packing import PackingResult


@dataclass
class StoredPage:
    page_id: str
    nbytes: int
    blocks: Tuple[int, ...]


@dataclass
class PageStore:
    """Private page sets per tensor + one shared set with reference counts."""

    page_bytes: int
    shared: Dict[str, StoredPage] = field(default_factory=dict)
    shared_owners: Dict[str, set] = field(default_factory=dict)
    private: Dict[str, Dict[str, StoredPage]] = field(default_factory=dict)
    _next_id: int = 0

    # -- construction -------------------------------------------------------

    @classmethod
    def from_packing(
        cls,
        packing: PackingResult,
        tensor_blocks: Dict[str, Sequence[int]],
        page_bytes: int,
    ) -> "PageStore":
        """Materialize a packing scheme: pages used by >1 tensor go to the
        shared set; single-owner pages go private."""
        store = cls(page_bytes=page_bytes)
        covers = {k: packing.cover(v) for k, v in tensor_blocks.items()}
        owners_of_page: Dict[int, List[str]] = {}
        for k, pages in covers.items():
            for p in pages:
                owners_of_page.setdefault(p, []).append(k)
        for p, owners in sorted(owners_of_page.items()):
            page = StoredPage(f"p{p}", page_bytes, tuple(packing.pages[p]))
            if len(owners) > 1:
                store.shared[page.page_id] = page
                store.shared_owners[page.page_id] = set(owners)
            else:
                store.private.setdefault(owners[0], {})[page.page_id] = page
        for k in tensor_blocks:
            store.private.setdefault(k, {})
        store._next_id = len(owners_of_page)
        return store

    # -- queries -------------------------------------------------------------

    def ref_count(self, page_id: str) -> int:
        if page_id in self.shared:
            return len(self.shared_owners[page_id])
        for owner_pages in self.private.values():
            if page_id in owner_pages:
                return 1
        raise KeyError(page_id)

    def pages_of(self, tensor_key: str) -> Dict[str, StoredPage]:
        out = dict(self.private.get(tensor_key, {}))
        for pid, owners in self.shared_owners.items():
            if tensor_key in owners:
                out[pid] = self.shared[pid]
        return out

    def tensors(self) -> List[str]:
        return sorted(self.private)

    def n_pages(self) -> int:
        return len(self.shared) + sum(len(p) for p in self.private.values())

    def total_bytes(self) -> int:
        return self.n_pages() * self.page_bytes

    def shared_bytes(self) -> int:
        return len(self.shared) * self.page_bytes

    # -- mutation (Sec. 3 'Model Removal and Updates') -----------------------

    def add_tensor(self, tensor_key: str, blocks: Sequence[int], shared_with: Dict[str, Sequence[str]] | None = None) -> None:
        """Insert a tensor given its block list; pages whose content matches
        an existing page are referenced instead of duplicated."""
        self.private.setdefault(tensor_key, {})
        existing = {frozenset(p.blocks): pid for pid, p in self.shared.items()}
        for owner, pages in self.private.items():
            for pid, p in pages.items():
                existing.setdefault(frozenset(p.blocks), pid)
        # naive chunking for insertion; real repacking is the online packer's job
        l = max(1, self.page_bytes // (8 * 2**20))
        for i in range(0, len(blocks), l):
            content = tuple(blocks[i : i + l])
            key = frozenset(content)
            if key in existing:
                pid = existing[key]
                if pid in self.shared:
                    self.shared_owners[pid].add(tensor_key)
                else:
                    # promote a private page to shared
                    for owner, pages in self.private.items():
                        if pid in pages:
                            page = pages.pop(pid)
                            self.shared[pid] = page
                            self.shared_owners[pid] = {owner, tensor_key}
                            break
            else:
                pid = f"p{self._next_id}"
                self._next_id += 1
                self.private[tensor_key][pid] = StoredPage(pid, self.page_bytes, content)

    def remove_tensor(self, tensor_key: str) -> None:
        """Drop private pages; decrement shared refs; demote ref==1 pages to
        the private set of the remaining owner."""
        self.private.pop(tensor_key, None)
        for pid in list(self.shared_owners):
            owners = self.shared_owners[pid]
            owners.discard(tensor_key)
            if len(owners) == 1:
                sole = next(iter(owners))
                self.private.setdefault(sole, {})[pid] = self.shared.pop(pid)
                del self.shared_owners[pid]
            elif not owners:
                self.shared.pop(pid)
                del self.shared_owners[pid]

    def update_tensor(self, tensor_key: str, blocks: Sequence[int]) -> None:
        self.remove_tensor(tensor_key)
        self.add_tensor(tensor_key, blocks)
