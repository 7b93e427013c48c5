"""Buffer pool simulator (bufferpool/pool.py)."""
import pytest

from repro.bufferpool.policies import LRUPolicy, PageMeta
from repro.bufferpool.pool import BufferPool
from repro.storage.costmodel import SSD


def meta(pid, nbytes=10, set_id="s", durable=True):
    return PageMeta(pid, nbytes, set_id, frozenset({"m"}), durable)


def make_pool(capacity=30):
    return BufferPool(capacity, LRUPolicy(), SSD)


def test_hit_miss_accounting():
    pool = make_pool()
    a = meta("a")
    pool.preload_disk(["a"])
    assert pool.access(a, "m") is False  # cold miss
    assert pool.access(a, "m") is True  # hit
    assert pool.stats.hits == 1 and pool.stats.misses == 1
    assert pool.stats.hit_ratio == 0.5


def test_read_miss_charges_io():
    pool = make_pool()
    pool.preload_disk(["a"])
    pool.access(meta("a"), "m")
    assert pool.stats.read_seconds == pytest.approx(SSD.read_seconds(10))


def test_write_allocate_no_read_io():
    pool = make_pool()
    pool.access(meta("h"), "m", write=True)
    assert pool.stats.read_seconds == 0.0
    assert pool.dirty["h"]


def test_read_of_unknown_page_raises():
    pool = make_pool()
    with pytest.raises(RuntimeError):
        pool.access(meta("ghost"), "m")


def test_capacity_eviction_lru():
    pool = make_pool(capacity=20)
    pool.preload_disk(["a", "b", "c"])
    pool.access(meta("a"), "m")
    pool.access(meta("b"), "m")
    pool.access(meta("c"), "m")  # evicts a (LRU)
    assert set(pool.resident) == {"b", "c"}
    assert pool.stats.evictions == 1
    assert pool.used == 20


def test_dirty_eviction_writes_back_and_enables_reload():
    pool = make_pool(capacity=20)
    pool.preload_disk(["a", "b"])
    pool.access(meta("h"), "m", write=True)  # dirty, not on disk yet
    pool.access(meta("a"), "m")
    pool.access(meta("b"), "m")  # evicts h -> writeback
    assert pool.stats.dirty_writebacks == 1
    assert pool.stats.write_seconds > 0
    assert "h" in pool.on_disk
    pool.access(meta("h"), "m")  # reload after spill is a read miss
    assert pool.stats.misses == 4


def test_drop_set_frees_without_io():
    pool = make_pool(capacity=30)
    pool.access(meta("h1", set_id="hm"), "m", write=True)
    pool.access(meta("h2", set_id="hm"), "m", write=True)
    pool.access(meta("x", set_id="other"), "m", write=True)
    io_before = pool.stats.io_seconds
    pool.drop_set("hm")
    assert set(pool.resident) == {"x"}
    assert pool.stats.io_seconds == io_before
    assert pool.used == 10


def test_page_larger_than_pool_raises():
    pool = make_pool(capacity=5)
    with pytest.raises(RuntimeError):
        pool.access(meta("big", nbytes=50), "m", write=True)


def test_bad_capacity():
    with pytest.raises(ValueError):
        BufferPool(0, LRUPolicy(), SSD)


def test_cpu_seconds_accumulate():
    pool = make_pool()
    pool.preload_disk(["a"])
    pool.access(meta("a"), "m")
    pool.access(meta("a"), "m")
    assert pool.stats.cpu_seconds == pytest.approx(2e-4)
