"""Replacement policies (bufferpool/policies.py)."""
from collections import OrderedDict

import pytest

from repro.bufferpool import policies as PL


def meta(pid, set_id="s", sharers=("m1",), nbytes=10, durable=True):
    return PL.PageMeta(pid, nbytes, set_id, frozenset(sharers), durable)


def run_accesses(policy, seq):
    resident = OrderedDict()
    for tick, (pid, set_id, model) in enumerate(seq, start=1):
        m = meta(pid, set_id)
        resident[pid] = m
        policy.on_access(m, model, tick)
    return resident


def test_lru_victim():
    p = PL.LRUPolicy()
    resident = run_accesses(p, [("a", "s", "m"), ("b", "s", "m"), ("a", "s", "m")])
    assert p.victim(resident, {}) == "b"


def test_mru_victim():
    p = PL.MRUPolicy()
    resident = run_accesses(p, [("a", "s", "m"), ("b", "s", "m"), ("a", "s", "m")])
    assert p.victim(resident, {}) == "a"


def test_lfu_victim():
    p = PL.LFUPolicy()
    resident = run_accesses(p, [("a", "s", "m"), ("a", "s", "m"), ("b", "s", "m")])
    assert p.victim(resident, {}) == "b"


def test_policy_on_evict_forgets():
    p = PL.LRUPolicy()
    resident = run_accesses(p, [("a", "s", "m"), ("b", "s", "m")])
    p.on_evict(resident.pop("a"))
    assert p.victim(resident, {}) == "b"


def test_locality_set_prefers_cold_set():
    p = PL.LocalitySetPolicy(intra="lru", window=100, horizon=10)
    seq = [("w1", "weights", "m")] + [("h%d" % i, "hashmap", "m") for i in range(20)]
    resident = run_accesses(p, seq)
    # hashmap set is hot (20 recent accesses), weights cold -> evict weights
    assert p.victim(resident, {}) == "w1"


def test_locality_set_intra_order():
    lru = PL.LocalitySetPolicy(intra="lru")
    resident = run_accesses(lru, [("a", "s", "m"), ("b", "s", "m")])
    assert lru.victim(resident, {}) == "a"
    mru = PL.LocalitySetPolicy(intra="mru")
    resident = run_accesses(mru, [("a", "s", "m"), ("b", "s", "m")])
    assert mru.victim(resident, {}) == "b"


def test_locality_set_dirty_durable_write_cost():
    p = PL.LocalitySetPolicy(intra="lru", read_cost=1.0, write_cost=100.0)
    resident = OrderedDict()
    a = meta("a", "s1")
    b = meta("b", "s2")
    for tick, m in enumerate([a, b], start=1):
        resident[m.page_id] = m
        p.on_access(m, "m", tick)
    # a is dirty+durable: costs a writeback, so b is the cheaper victim
    assert p.victim(resident, {"a": True}) == "b"


def test_optimized_drops_dead_sets_first():
    p = PL.OptimizedPolicy(intra="lru", horizon=1.0)
    resident = OrderedDict()
    shared = PL.PageMeta("w", 10, "weights/shared", frozenset({"m1", "m2"}), True)
    dead = PL.PageMeta("h", 10, "hashmap/m0", frozenset({"m0"}), False)
    for tick, m in enumerate([shared, dead], start=1):
        resident[m.page_id] = m
        p.on_access(m, "m0", tick)
    p.declare({("m1", "weights/shared"): 1.0, ("m2", "weights/shared"): 1.0}, {"m1", "m2"})
    # m0 finished: its hashmap has zero pending rate -> evicted first
    assert p.victim(resident, {}) == "h"


def test_optimized_rewards_sharing():
    p = PL.OptimizedPolicy(intra="lru", horizon=1.0)
    resident = OrderedDict()
    shared = PL.PageMeta("ws", 10, "weights/shared", frozenset({"m1", "m2", "m3"}), True)
    private = PL.PageMeta("wp", 10, "weights/m1", frozenset({"m1"}), True)
    for tick, m in enumerate([shared, private], start=1):
        resident[m.page_id] = m
        p.on_access(m, "m1", tick)
    rates = {
        ("m1", "weights/shared"): 1.0,
        ("m2", "weights/shared"): 1.0,
        ("m3", "weights/shared"): 1.0,
        ("m1", "weights/m1"): 1.0,
    }
    p.declare(rates, {"m1", "m2", "m3"})
    # p_reuse(shared by 3) > p_reuse(private): evict the private page
    assert p.victim(resident, {}) == "wp"


def test_make_policy_factory():
    for name in PL.POLICY_NAMES:
        pol = PL.make_policy(name)
        assert pol.name == name
    with pytest.raises(ValueError):
        PL.make_policy("FIFO")


def test_locality_set_rejects_bad_intra():
    with pytest.raises(ValueError):
        PL.LocalitySetPolicy(intra="fifo")
