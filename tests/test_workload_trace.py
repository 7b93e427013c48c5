"""Serving trace generation (serving/workload.py)."""
import pytest

from repro.serving import workload as W
from repro.serving.simulator import store_for


@pytest.fixture(scope="module")
def trace(w2v_wl, w2v_dedup):
    ids = [m.model_id for m in w2v_wl.models]
    store = store_for(w2v_wl, ids, w2v_dedup)
    return W.build_serving_trace(store, w2v_wl.serving_profile, ids, store.page_bytes), ids


def test_no_dedup_tensor_blocks_all_unique(w2v_wl):
    tb = W.no_dedup_tensor_blocks(w2v_wl)
    all_ids = [i for v in tb.values() for i in v]
    assert len(all_ids) == len(set(all_ids)) == 6 * 512


def test_model_weight_pages_sharers(w2v_wl, w2v_dedup):
    ids = [m.model_id for m in w2v_wl.models]
    store = store_for(w2v_wl, ids, w2v_dedup)
    pages = W.model_weight_pages(store, "w2v-1")
    shared = [p for p in pages.values() if p.locality_set == "weights/shared"]
    private = [p for p in pages.values() if p.locality_set == "weights/w2v-1"]
    assert shared and private
    assert all(len(p.sharers) > 1 for p in shared)
    assert all(p.sharers == frozenset({"w2v-1"}) for p in private)


def test_trace_event_kinds(trace):
    t, ids = trace
    kinds = {e.kind for e in t.events}
    assert kinds == {"access", "drop_set", "declare"}


def test_trace_declares_precede_each_model(trace):
    t, ids = trace
    declares = [e for e in t.events if e.kind == "declare"]
    assert len(declares) == len(ids)
    # pending shrinks by one model each time
    sizes = [len(e.pending) for e in declares]
    assert sizes == sorted(sizes, reverse=True)


def test_trace_drops_dead_sets(trace):
    t, ids = trace
    dropped = [e.set_id for e in t.events if e.kind == "drop_set"]
    for m in ids:
        assert f"hashmap/{m}" in dropped
        assert f"inter/{m}" in dropped


def test_trace_probe_phase_is_cyclic(trace):
    t, ids = trace
    m = ids[0]
    probes = [
        e.page.page_id
        for e in t.events
        if e.kind == "access" and e.model == m and e.page.locality_set == f"hashmap/{m}" and not e.write
    ]
    # cyclic cursor: consecutive probe indices increase mod n
    idx = [int(p.rsplit("/", 1)[1]) for p in probes]
    n = max(idx) + 1
    assert all((b - a) % n == 1 for a, b in zip(idx, idx[1:]))


def test_trace_preload_covers_weights_and_input(trace):
    t, ids = trace
    preload = set(t.preload)
    for e in t.events:
        if e.kind == "access" and not e.write and e.page.durable:
            assert e.page.page_id in preload


def test_trace_hashmap_written_before_probed(trace):
    t, ids = trace
    m = ids[0]
    seen_writes = set()
    for e in t.events:
        if e.kind != "access" or e.model != m:
            continue
        if e.page.locality_set == f"hashmap/{m}":
            if e.write:
                seen_writes.add(e.page.page_id)
            else:
                assert e.page.page_id in seen_writes


def test_input_shared_across_models(trace):
    t, ids = trace
    input_pages = [p for p in t.pages.values() if p.locality_set == "input"]
    assert input_pages
    assert all(p.sharers == frozenset(ids) for p in input_pages)


def test_private_input_when_not_shared(w2v_wl, w2v_dedup):
    import dataclasses

    ids = [m.model_id for m in w2v_wl.models[:2]]
    store = store_for(w2v_wl, ids, w2v_dedup)
    prof = dataclasses.replace(w2v_wl.serving_profile, input_shared=False)
    t = W.build_serving_trace(store, prof, ids, store.page_bytes)
    sets = {p.locality_set for p in t.pages.values() if p.locality_set.startswith("input")}
    assert sets == {f"input/{m}" for m in ids}
