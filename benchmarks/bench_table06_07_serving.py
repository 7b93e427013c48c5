"""Benchmarks for Tables 6/7: text-classification and FFNN serving grids."""
from repro.serving.simulator import simulate_serving, store_for

GB = 2**30


def _serve(art, key, disk, pool_gb, policy):
    wl = art[key]
    ids = [m.model_id for m in wl.models]
    store = store_for(wl, ids, art[f"{key}_dedup"])
    return simulate_serving(
        store, wl.serving_profile, ids,
        disk=disk, pool_bytes=pool_gb * GB, policy=policy,
    )


def bench_table06_textclf_serving(benchmark, art):
    rep = benchmark.pedantic(
        lambda: _serve(art, "textclf", "SSD", 10, "Optimized-M"), rounds=3, iterations=1
    )
    assert rep.latency_seconds > 0


def bench_table07_ffnn_serving(benchmark, art):
    rep = benchmark.pedantic(
        lambda: _serve(art, "ffnn", "HDD", 9, "Optimized-M"), rounds=3, iterations=1
    )
    assert rep.latency_seconds > 0
