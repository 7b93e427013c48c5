"""Online page packing (paper Sec. 5.4 'Online Packing', Table 13).

When a new tensor arrives, "the list of tensor blocks in this tensor as well
as all related tensors will be retrieved to run the proposed algorithm ...
Only these pages that need to be changed will be repacked again."

We implement that incrementally:

1. Recompute the equivalence classes over the accumulated tensors.
2. A kept page must be *class-pure*: all of its blocks fall in one current
   equivalence class (then the page is usable, unchanged, by every owner of
   that class). Pages whose blocks' owner sets diverged are *discarded*.
3. Blocks stranded by discarded pages, plus the new tensor's blocks that are
   not already covered, are repacked with the two-stage strategy (restricted
   to those blocks) — these are the *created* pages.

This keeps the bulk of the page set stable as models arrive (the paper
reuses ~80% of pages per step) while preserving the exact-cover invariant.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, FrozenSet, List, Sequence, Set, Tuple

from repro.paging.packing import (
    Page,
    PackingResult,
    _alg3,
    _chunk,
    equivalence_classes,
    owners_map,
)


@dataclass
class OnlineStep:
    step: int
    tensor_key: str
    pages_reused: int
    pages_discarded: int
    pages_created: int
    total_pages: int
    packing: PackingResult


def _pack_increment(
    tensor_blocks: Dict[str, Sequence[int]],
    kept: List[Page],
    l: int,
) -> List[Page]:
    """Two-stage packing of everything not covered by the kept pages."""
    covered: Set[int] = set()
    for page in kept:
        covered.update(page)
    classes = equivalence_classes(tensor_blocks)
    full: List[Page] = []
    stranded: List[int] = []
    for owner_set in sorted(classes, key=lambda s: tuple(sorted(s))):
        remaining = [it for it in classes[owner_set] if it not in covered]
        for page in _chunk(remaining, l):
            if len(page) == l:
                full.append(page)
            else:
                stranded.extend(page)
    owners = owners_map(tensor_blocks)
    freq = {it: len(s) for it, s in owners.items()}
    stranded_set = set(stranded)
    reduced = {
        k: sorted(set(v) & stranded_set)
        for k, v in tensor_blocks.items()
        if set(v) & stranded_set
    }
    return full + _alg3(reduced, freq, l)


def online_packing(
    tensor_blocks: Dict[str, Sequence[int]],
    l: int,
) -> List[OnlineStep]:
    """Add tensors one at a time (dict order = arrival order)."""
    steps: List[OnlineStep] = []
    pages: List[Page] = []
    acc: Dict[str, Sequence[int]] = {}
    for i, key in enumerate(tensor_blocks, start=1):
        acc[key] = tensor_blocks[key]
        owners = owners_map(acc)
        # Keep class-pure pages (all blocks share one owner set).
        kept: List[Page] = []
        discarded = 0
        for page in pages:
            page_owner_sets = {owners.get(b) for b in page}
            if len(page_owner_sets) == 1 and None not in page_owner_sets:
                kept.append(page)
            else:
                discarded += 1
        created_pages = _pack_increment(acc, kept, l)
        pages = kept + created_pages
        result = PackingResult("online-two-stage", pages, 0.0, l)
        result.validate(acc)
        steps.append(
            OnlineStep(
                step=i,
                tensor_key=key,
                pages_reused=len(kept),
                pages_discarded=discarded,
                pages_created=len(created_pages),
                total_pages=len(pages),
                packing=result,
            )
        )
    return steps
