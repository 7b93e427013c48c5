"""Online packing (paging/online.py, Table 13)."""
import pytest

from repro.paging.online import online_packing


def test_first_step_creates_everything():
    tb = {"t1": list(range(16))}
    steps = online_packing(tb, 8)
    assert steps[0].pages_reused == 0
    assert steps[0].pages_created == 2
    assert steps[0].total_pages == 2


def test_identical_second_tensor_reuses_all():
    tb = {"t1": list(range(16)), "t2": list(range(16))}
    steps = online_packing(tb, 8)
    assert steps[1].pages_reused == 2
    assert steps[1].pages_discarded == 0
    assert steps[1].pages_created == 0


def test_disjoint_second_tensor_only_creates():
    tb = {"t1": list(range(8)), "t2": list(range(100, 108))}
    steps = online_packing(tb, 8)
    assert steps[1].pages_reused == 1
    assert steps[1].pages_created == 1


def test_each_step_validates():
    tb = {
        "t1": list(range(12)),
        "t2": list(range(6)) + list(range(20, 26)),
        "t3": list(range(3)) + list(range(30, 39)),
    }
    steps = online_packing(tb, 4)
    # validate() already ran inside online_packing; check bookkeeping too
    for prev, cur in zip(steps, steps[1:]):
        assert cur.total_pages == cur.pages_reused + cur.pages_created
        assert cur.pages_reused + cur.pages_discarded == prev.total_pages


def test_planted_workload_reuses_majority(textclf_wl, textclf_dedup):
    """Paper Table 13: ~80% of pages reused at each step."""
    tb = textclf_dedup.tensor_block_lists()
    steps = online_packing(tb, textclf_wl.blocks_per_page)
    assert len(steps) == 5
    assert steps[0].pages_created == 64
    for s in steps[1:]:
        assert s.pages_reused / (s.pages_reused + s.pages_discarded) >= 0.7


def test_final_online_count_close_to_offline(textclf_wl, textclf_dedup):
    from repro.paging.packing import pack_two_stage

    tb = textclf_dedup.tensor_block_lists()
    steps = online_packing(tb, textclf_wl.blocks_per_page)
    offline = pack_two_stage(tb, textclf_wl.blocks_per_page).n_pages()
    assert steps[-1].total_pages <= offline + 10  # incremental overhead bounded
