"""End-to-end serving simulator shape checks (serving/simulator.py)."""
import pytest

from repro.serving.simulator import ServingReport, simulate_serving, serving_grid, store_for

GB = 2**30


@pytest.fixture(scope="module")
def w2v_ids(w2v_wl):
    return [m.model_id for m in w2v_wl.models]


def _run(wl, dedup, ids, disk="SSD", pool=15, policy="LRU"):
    store = store_for(wl, ids, dedup)
    return simulate_serving(
        store, wl.serving_profile, ids, disk=disk, pool_bytes=pool * GB, policy=policy
    )


def test_dedup_store_smaller(w2v_wl, w2v_dedup, w2v_ids):
    nod = store_for(w2v_wl, w2v_ids, None)
    ded = store_for(w2v_wl, w2v_ids, w2v_dedup)
    assert nod.total_bytes() == 384 * 64 * 2**20  # 24 GB, paper Sec. 7.2.1
    assert ded.total_bytes() < nod.total_bytes() / 3  # >3x reduction


def test_dedup_reduces_latency(w2v_wl, w2v_dedup, w2v_ids):
    nod = _run(w2v_wl, None, w2v_ids)
    ded = _run(w2v_wl, w2v_dedup, w2v_ids)
    assert ded.latency_seconds < nod.latency_seconds
    assert ded.hit_ratio > nod.hit_ratio


def test_hdd_slower_than_ssd(w2v_wl, w2v_dedup, w2v_ids):
    ssd = _run(w2v_wl, w2v_dedup, w2v_ids, disk="SSD")
    hdd = _run(w2v_wl, w2v_dedup, w2v_ids, disk="HDD")
    assert hdd.latency_seconds > ssd.latency_seconds
    assert hdd.misses == ssd.misses  # same trace, same policy decisions' costs


def test_smaller_pool_not_faster(w2v_wl, w2v_dedup, w2v_ids):
    big = _run(w2v_wl, w2v_dedup, w2v_ids, pool=15)
    small = _run(w2v_wl, w2v_dedup, w2v_ids, pool=8)
    assert small.latency_seconds >= big.latency_seconds
    assert small.hit_ratio <= big.hit_ratio


def test_optimized_policy_rescues_small_pool(w2v_wl, w2v_dedup, w2v_ids):
    """The Table 2 HDD/8GB phenomenon: optimized caching wins big."""
    lru = _run(w2v_wl, w2v_dedup, w2v_ids, disk="HDD", pool=8, policy="LRU")
    opt = _run(w2v_wl, w2v_dedup, w2v_ids, disk="HDD", pool=8, policy="Optimized-M")
    assert opt.latency_seconds < 0.6 * lru.latency_seconds
    assert opt.hit_ratio > lru.hit_ratio


def test_latency_grows_with_models(w2v_wl, w2v_dedup):
    ids = [m.model_id for m in w2v_wl.models]
    lat = [
        _run(w2v_wl, w2v_dedup, ids[:n]).latency_seconds for n in (2, 4, 6)
    ]
    assert lat[0] < lat[1] < lat[2]


def test_report_row_fields(w2v_wl, w2v_dedup, w2v_ids):
    rep = _run(w2v_wl, w2v_dedup, w2v_ids)
    row = rep.row()
    assert set(row) >= {"latency_s", "io_s", "hit_ratio", "misses"}
    assert rep.latency_seconds == pytest.approx(
        rep.compute_seconds + rep.io_seconds + (rep.latency_seconds - rep.compute_seconds - rep.io_seconds)
    )


def test_serving_grid_shape(w2v_wl, w2v_dedup):
    reports = serving_grid(
        w2v_wl, w2v_dedup, model_counts=[2], disks=["SSD"], pool_bytes=15 * GB
    )
    assert len(reports) == 2
    assert isinstance(reports[0], ServingReport)


def test_ffnn_shapes(ffnn_wl, ffnn_dedup):
    ids = [m.model_id for m in ffnn_wl.models]
    nod = _run(ffnn_wl, None, ids, pool=13)
    ded = _run(ffnn_wl, ffnn_dedup, ids, pool=13)
    assert ded.latency_seconds < nod.latency_seconds
    # paper Sec. 7.2.3: storage 15 GB -> 5.4 GB
    assert store_for(ffnn_wl, ids, None).total_bytes() > 2.5 * store_for(ffnn_wl, ids, ffnn_dedup).total_bytes()


def test_textclf_storage_reduction(textclf_wl, textclf_dedup):
    ids = [m.model_id for m in textclf_wl.models]
    nod = store_for(textclf_wl, ids, None)
    ded = store_for(textclf_wl, ids, textclf_dedup)
    assert nod.n_pages() == 320  # paper: 320 pages / 20.5 GB
    assert 80 <= ded.n_pages() <= 90  # paper: 87 pages / 5.6 GB
