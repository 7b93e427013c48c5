"""Benchmarks for Tables 1/2: the word2vec serving simulator.

One benchmark per configuration family; each regenerates the row's latency
(the harness `experiments.tables.table01/table02` prints the full tables).
"""
import pytest

from repro.serving.simulator import simulate_serving, store_for

GB = 2**30


def _serve(art, dedup, disk, pool_gb, policy):
    wl = art["w2v"]
    ids = [m.model_id for m in wl.models]
    store = store_for(wl, ids, art["w2v_dedup"] if dedup else None)
    return simulate_serving(
        store, wl.serving_profile, ids,
        disk=disk, pool_bytes=pool_gb * GB, policy=policy,
    )


def bench_table01_no_dedup_ssd(benchmark, art):
    rep = benchmark.pedantic(lambda: _serve(art, False, "SSD", 15, "LRU"), rounds=3, iterations=1)
    assert rep.latency_seconds > 0


def bench_table01_dedup_optimized_ssd(benchmark, art):
    rep = benchmark.pedantic(lambda: _serve(art, True, "SSD", 15, "Optimized-M"), rounds=3, iterations=1)
    assert rep.latency_seconds > 0


def bench_table02_pathological_hdd_8gb(benchmark, art):
    """The Table 2 HDD/8GB row: the most eviction-heavy simulation."""
    rep = benchmark.pedantic(lambda: _serve(art, True, "HDD", 8, "Optimized-M"), rounds=3, iterations=1)
    assert rep.latency_seconds > 0
