"""Page packing algorithms (paging/packing.py): paper examples + properties."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.paging import packing as P


def fig3_workload():
    """Fig. 3: two tensors, 12 shared + 4 private blocks each, page = 4.

    Private blocks interleave with shared ones in write order, so default
    write-order packing cannot share pages; the optimal scheme needs 5.
    """
    shared = list(range(12))
    p1 = [100, 101, 102, 103]
    p2 = [200, 201, 202, 203]
    t1 = shared[:2] + p1[:2] + shared[2:7] + p1[2:] + shared[7:]
    t2 = shared[:3] + p2[:2] + shared[3:9] + p2[2:] + shared[9:]
    return {"t1": t1, "t2": t2}, 4


def fig5_workload():
    """Fig. 5's phenomenon: classes smaller than a page strand pages in the
    class-based greedy; Alg. 3 repacking shares the hot item."""
    return {"t1": [1, 2], "t2": [1, 3]}, 2


@pytest.mark.parametrize("alg", list(P.ALGORITHMS))
def test_fig3_validates(alg):
    tb, l = fig3_workload()
    r = P.ALGORITHMS[alg](tb, l)
    r.validate(tb)


def test_fig3_counts():
    tb, l = fig3_workload()
    two = P.pack_two_stage(tb, l).n_pages()
    base = P.pack_baseline(tb, l).n_pages()
    assert two == 5  # the optimal plan of Fig. 3
    assert base == 8  # the default write-order plan of Fig. 3


def test_fig5_two_stage_beats_greedy1():
    tb, l = fig5_workload()
    g1 = P.pack_greedy1(tb, l)
    two = P.pack_two_stage(tb, l)
    g1.validate(tb)
    two.validate(tb)
    assert g1.n_pages() == 3
    assert two.n_pages() == 2


def test_equivalence_classes_grouping():
    tb = {"a": [1, 2, 3], "b": [1, 2, 4], "c": [1, 5]}
    classes = P.equivalence_classes(tb)
    assert classes[frozenset({"a", "b", "c"})] == [1]
    assert classes[frozenset({"a", "b"})] == [2]
    assert sorted(classes[frozenset({"a"})]) == [3]
    assert sorted(classes[frozenset({"b"})]) == [4]
    assert sorted(classes[frozenset({"c"})]) == [5]


def test_equivalence_classes_write_order_stability():
    """Class items follow the first owner's write order (online packing
    depends on this)."""
    tb = {"a": [9, 1, 5], "b": [9, 1, 5]}
    classes = P.equivalence_classes(tb)
    assert classes[frozenset({"a", "b"})] == [9, 1, 5]


def test_owners_map():
    tb = {"a": [1, 2], "b": [2, 3]}
    owners = P.owners_map(tb)
    assert owners == {1: frozenset({"a"}), 2: frozenset({"a", "b"}), 3: frozenset({"b"})}


def test_cover_exactness():
    tb = {"t1": [1, 2, 3, 4]}
    r = P.pack_greedy1(tb, 2)
    cover = r.cover([1, 2, 3, 4])
    covered = set()
    for i in cover:
        covered |= set(r.pages[i])
    assert covered == {1, 2, 3, 4}


def test_cover_raises_on_uncoverable():
    r = P.PackingResult("x", [(1, 2)], 0.0, 2)
    with pytest.raises(ValueError):
        r.cover([1])  # page {1,2} is not a subset of {1}


def test_validate_rejects_oversized_page():
    r = P.PackingResult("x", [(1, 2, 3)], 0.0, 2)
    with pytest.raises(AssertionError):
        r.validate({"t": [1, 2, 3]})


def test_ref_counts():
    tb = {"t1": [1, 2], "t2": [1, 3]}
    r = P.pack_greedy1(tb, 2)
    refs = r.ref_counts(tb)
    shared_page = [i for i, p in enumerate(r.pages) if set(p) == {1}][0]
    assert refs[shared_page] == 2


def test_baseline_page_dedup():
    tb = {"t1": [1, 2, 3, 4], "t2": [1, 2, 3, 4]}
    r = P.pack_baseline(tb, 2)
    assert r.n_pages() == 2  # identical pages stored once


def test_greedy2_reuses_contained_bins():
    tb = {"big": [1, 2, 3, 4], "small": [1, 2]}
    r = P.pack_greedy2(tb, 2)
    r.validate(tb)
    # big packs [hot items first]; small finds a fully-contained bin to reuse
    assert r.n_pages() == 2


def test_two_stage_keeps_full_pages_intact():
    tb = {"t1": list(range(8))}
    r = P.pack_two_stage(tb, 4)
    assert sorted(len(p) for p in r.pages) == [4, 4]


_items = st.lists(st.integers(0, 30), min_size=1, max_size=25, unique=True)


@settings(max_examples=60, deadline=None)
@given(st.dictionaries(st.sampled_from(["t1", "t2", "t3", "t4"]), _items, min_size=1, max_size=4),
       st.integers(1, 6))
def test_property_all_algorithms_cover(tb, l):
    for alg, fn in P.ALGORITHMS.items():
        r = fn(tb, l)
        r.validate(tb)


@settings(max_examples=60, deadline=None)
@given(st.dictionaries(st.sampled_from(["t1", "t2", "t3", "t4"]), _items, min_size=1, max_size=4),
       st.integers(1, 6))
def test_property_page_count_lower_bound(tb, l):
    """No algorithm can beat ceil(#distinct/l); duplication only adds pages.

    (Two-stage <= greedy-1 does NOT hold universally — Alg. 3's
    largest-tensor-first ordering can lose on adversarial owner sets, just
    as the paper's own Table 11 shows Greedy-2 losing to Greedy-1 — so the
    ordering is asserted only on the realistic planted workloads below.)
    """
    n_distinct = len({i for v in tb.values() for i in v})
    lower = -(-n_distinct // l)
    for fn in P.ALGORITHMS.values():
        assert fn(tb, l).n_pages() >= lower


def test_planted_workload_counts(textclf_dedup, textclf_wl):
    """End-to-end: packing the real dedup output lands near the paper's
    Table 11 text-classification row (101 / 87 / 91 / 87)."""
    tb = textclf_dedup.tensor_block_lists()
    l = textclf_wl.blocks_per_page
    counts = {alg: P.ALGORITHMS[alg](tb, l).n_pages() for alg in P.ALGORITHMS}
    assert 95 <= counts["baseline"] <= 110
    assert 80 <= counts["two-stage"] <= 90
    assert counts["two-stage"] <= counts["greedy1"] <= counts["baseline"]
    assert counts["two-stage"] <= counts["baseline"]
