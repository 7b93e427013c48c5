"""Page store semantics (paper Sec. 3): shared sets, ref counts, removal."""
import pytest

from repro.paging.packing import pack_greedy1, pack_two_stage
from repro.storage.pagestore import PageStore


@pytest.fixture
def store():
    tb = {"t1": [1, 2, 3, 4], "t2": [1, 2, 5, 6]}
    packing = pack_greedy1(tb, 2)
    return PageStore.from_packing(packing, tb, page_bytes=100), tb


def test_shared_private_split(store):
    s, tb = store
    assert len(s.shared) == 1  # the {1,2} page
    assert len(s.private["t1"]) == 1
    assert len(s.private["t2"]) == 1
    assert s.n_pages() == 3


def test_ref_count(store):
    s, _ = store
    shared_pid = next(iter(s.shared))
    assert s.ref_count(shared_pid) == 2
    private_pid = next(iter(s.private["t1"]))
    assert s.ref_count(private_pid) == 1
    with pytest.raises(KeyError):
        s.ref_count("nope")


def test_pages_of(store):
    s, tb = store
    pages = s.pages_of("t1")
    blocks = set()
    for p in pages.values():
        blocks |= set(p.blocks)
    assert blocks == {1, 2, 3, 4}


def test_total_bytes(store):
    s, _ = store
    assert s.total_bytes() == 300
    assert s.shared_bytes() == 100


def test_remove_tensor_demotes_shared_page(store):
    s, _ = store
    shared_pid = next(iter(s.shared))
    s.remove_tensor("t2")
    assert shared_pid not in s.shared
    assert shared_pid in s.private["t1"]  # ref dropped to 1 -> demoted
    assert "t2" not in s.private
    assert s.n_pages() == 2


def test_remove_last_owner_drops_page():
    tb = {"t1": [1, 2]}
    s = PageStore.from_packing(pack_greedy1(tb, 2), tb, 100)
    s.remove_tensor("t1")
    assert s.n_pages() == 0


def test_update_tensor_roundtrip(store):
    s, _ = store
    s.update_tensor("t2", [1, 2, 7, 8])
    blocks = set()
    for p in s.pages_of("t2").values():
        blocks |= set(p.blocks)
    assert blocks == {1, 2, 7, 8}


def test_add_tensor_promotes_matching_private_page():
    tb = {"t1": [1, 2, 3, 4]}
    s = PageStore.from_packing(pack_greedy1(tb, 2), tb, 2 * 8 * 2**20)
    s.add_tensor("t2", [1, 2])
    # the {1,2} page should now be shared between t1 and t2
    shared_blocks = [set(p.blocks) for p in s.shared.values()]
    assert {1, 2} in shared_blocks
    assert s.ref_count(next(iter(s.shared))) == 2


def test_from_two_stage_packing(textclf_packed, textclf_wl):
    tb, packed = textclf_packed
    s = PageStore.from_packing(packed, tb, 64 * 2**20)
    # Table 5: 51 pages shared by all 5 models survive as shared pages
    assert len(s.shared) >= 60
    assert s.n_pages() == packed.n_pages()
    total_gb = s.total_bytes() / 2**30
    assert 5.0 <= total_gb <= 6.0  # paper: 5.6 GB after dedup
