"""Page packing (paper Sec. 5): group distinct tensor blocks into pages.

Input: ``tensor_blocks`` mapping each tensor key ('model/tensor') to its
ordered list of distinct-block ids (the dedup index's F_T output), plus the
page capacity ``l``. Output: a set of pages (tuples of distinct ids) such that
**every tensor is exactly covered** by some subset of pages (condition (5) of
the formalization — an item may be stored in several pages).

Four algorithms, exactly the paper's Sec. 7.4 lineup:

* ``pack_baseline``    — write-order packing + duplicate-page elimination.
* ``pack_greedy1``     — equivalence-class packing (Alg. 2).
* ``pack_greedy2``     — approximation strategy over all blocks (Alg. 3):
                         largest-tensor-first, page reuse by maximal-subset,
                         hottest-block-first residual packing.
* ``pack_two_stage``   — Alg. 2 first, then Alg. 3 over the items stranded in
                         non-full pages (the proposed strategy).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, FrozenSet, List, Sequence, Tuple

Page = Tuple[int, ...]


@dataclass
class PackingResult:
    algorithm: str
    pages: List[Page]
    seconds: float
    blocks_per_page: int

    def n_pages(self) -> int:
        return len(self.pages)

    def page_sets(self) -> List[FrozenSet[int]]:
        return [frozenset(p) for p in self.pages]

    def cover(self, tensor_items: Sequence[int]) -> List[int]:
        """Indexes of pages forming an exact cover of the tensor (greedy over
        usable pages — every usable page is a subset of the tensor, so any
        union of them stays within the tensor)."""
        t = set(tensor_items)
        chosen, covered = [], set()
        for i, page in enumerate(self.pages):
            ps = set(page)
            if ps <= t and not ps <= covered:
                chosen.append(i)
                covered |= ps
        if covered != t:
            missing = t - covered
            raise ValueError(
                f"{self.algorithm}: tensor not exactly coverable; missing {len(missing)} items"
            )
        return chosen

    def validate(self, tensor_blocks: Dict[str, Sequence[int]]) -> None:
        """Assert the exact-cover condition and the capacity bound."""
        for page in self.pages:
            if len(page) > self.blocks_per_page:
                raise AssertionError("page over capacity")
        for key, items in tensor_blocks.items():
            self.cover(items)  # raises if not coverable

    def ref_counts(self, tensor_blocks: Dict[str, Sequence[int]]) -> Dict[int, int]:
        """page index -> number of tensors whose exact cover uses the page."""
        counts = {i: 0 for i in range(len(self.pages))}
        for key, items in tensor_blocks.items():
            for i in self.cover(items):
                counts[i] += 1
        return counts


def owners_map(tensor_blocks: Dict[str, Sequence[int]]) -> Dict[int, FrozenSet[str]]:
    """distinct id -> set of tensors that contain it."""
    owners: Dict[int, set] = {}
    for key, items in tensor_blocks.items():
        for it in set(items):
            owners.setdefault(it, set()).add(key)
    return {it: frozenset(s) for it, s in owners.items()}


def equivalence_classes(
    tensor_blocks: Dict[str, Sequence[int]]
) -> Dict[FrozenSet[str], List[int]]:
    """Group distinct ids by their owner set (paper's equivalent classes).

    Items within a class follow the *write order* of the class's first owner
    (every item in a class shares the same owner set, so this is one tensor's
    block order). Write order is stable when models are added incrementally,
    which is what lets the online packer reuse pages; distinct-id order would
    instead reflect Alg. 1's magnitude ordering and scramble page contents.
    """
    owners = owners_map(tensor_blocks)
    rank: Dict[int, Tuple[str, int]] = {}
    for k in sorted(tensor_blocks):
        for idx, it in enumerate(tensor_blocks[k]):
            rank.setdefault(it, (k, idx))
    classes: Dict[FrozenSet[str], List[int]] = {}
    for it in sorted(owners, key=lambda i: rank[i]):
        classes.setdefault(owners[it], []).append(it)
    return classes


def _chunk(items: Sequence[int], l: int) -> List[Page]:
    return [tuple(items[i : i + l]) for i in range(0, len(items), l)]


# ---------------------------------------------------------------------------
# Baseline: write-order packing + duplicate-page elimination
# ---------------------------------------------------------------------------


def pack_baseline(tensor_blocks: Dict[str, Sequence[int]], l: int) -> PackingResult:
    """Pack each tensor's blocks in write order, then physically store each
    distinct page once. Duplicate detection is the naive pairwise page
    comparison the paper's baseline performs (its Table 12 cost)."""
    t0 = time.perf_counter()
    candidate: List[Page] = []
    for key in tensor_blocks:
        candidate.extend(_chunk(list(tensor_blocks[key]), l))
    pages: List[Page] = []
    for page in candidate:
        ps = sorted(page)
        duplicate = False
        for kept in pages:  # deliberate O(n^2) scan — the measured baseline
            if len(kept) == len(ps) and sorted(kept) == ps:
                duplicate = True
                break
        if not duplicate:
            pages.append(page)
    return PackingResult("baseline", pages, time.perf_counter() - t0, l)


# ---------------------------------------------------------------------------
# Alg. 2: equivalence-class greedy (Greedy-1)
# ---------------------------------------------------------------------------


def pack_greedy1(tensor_blocks: Dict[str, Sequence[int]], l: int) -> PackingResult:
    t0 = time.perf_counter()
    classes = equivalence_classes(tensor_blocks)
    pages: List[Page] = []
    for owner_set in sorted(classes, key=lambda s: tuple(sorted(s))):
        pages.extend(_chunk(classes[owner_set], l))
    return PackingResult("greedy1", pages, time.perf_counter() - t0, l)


# ---------------------------------------------------------------------------
# Alg. 3: approximation strategy (Greedy-2); also stage 2 of Two-Stage
# ---------------------------------------------------------------------------


def _alg3(
    tensor_sets: Dict[str, List[int]],
    sharing_freq: Dict[int, int],
    l: int,
    initial_bins: List[Page] | None = None,
) -> List[Page]:
    """Largest-tensor-first packing with page reuse (Alg. 3 body).

    For each tensor (descending block count): reuse existing bins fully
    contained in the tensor, then pack the residual ordered by sharing
    frequency (hottest-block-first), leaving no holes except the last page.
    """
    bins: List[Page] = list(initial_bins or [])
    order = sorted(tensor_sets, key=lambda k: (-len(tensor_sets[k]), k))
    for idx, key in enumerate(order):
        t = set(tensor_sets[key])
        if idx > 0 or bins:
            covered = set()
            for b in bins:
                bs = set(b)
                if bs <= t:
                    covered |= bs
            residual = t - covered
            if not residual:
                continue
        else:
            residual = t
        ordered = sorted(residual, key=lambda it: (-sharing_freq.get(it, 1), it))
        bins.extend(_chunk(ordered, l))
    return bins


def pack_greedy2(tensor_blocks: Dict[str, Sequence[int]], l: int) -> PackingResult:
    t0 = time.perf_counter()
    owners = owners_map(tensor_blocks)
    freq = {it: len(s) for it, s in owners.items()}
    tensor_sets = {k: sorted(set(v)) for k, v in tensor_blocks.items()}
    pages = _alg3(tensor_sets, freq, l)
    return PackingResult("greedy2", pages, time.perf_counter() - t0, l)


# ---------------------------------------------------------------------------
# Two-stage strategy (proposed)
# ---------------------------------------------------------------------------


def pack_two_stage(tensor_blocks: Dict[str, Sequence[int]], l: int) -> PackingResult:
    t0 = time.perf_counter()
    classes = equivalence_classes(tensor_blocks)
    full_pages: List[Page] = []
    stranded: List[int] = []
    for owner_set in sorted(classes, key=lambda s: tuple(sorted(s))):
        chunks = _chunk(classes[owner_set], l)
        for page in chunks:
            if len(page) == l:
                full_pages.append(page)
            else:
                stranded.extend(page)
    stranded_set = set(stranded)
    owners = owners_map(tensor_blocks)
    freq = {it: len(s) for it, s in owners.items()}
    # Stage 2: each tensor restricted to its items stranded in non-full bins.
    reduced = {
        k: sorted(set(v) & stranded_set)
        for k, v in tensor_blocks.items()
        if set(v) & stranded_set
    }
    stage2 = _alg3(reduced, freq, l)
    return PackingResult("two-stage", full_pages + stage2, time.perf_counter() - t0, l)


ALGORITHMS = {
    "baseline": pack_baseline,
    "greedy1": pack_greedy1,
    "greedy2": pack_greedy2,
    "two-stage": pack_two_stage,
}
