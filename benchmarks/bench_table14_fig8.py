"""Benchmarks for Table 14 (compression kernels) and the Fig. 8 cache study."""
from repro import compression as C
from repro.serving.simulator import simulate_serving, store_for

GB = 2**30


def bench_table14_prune_all_models(benchmark, art):
    wl = art["textclf"]
    thresh = C.common_prune_threshold(wl.models, 0.85)

    def prune():
        return [C.prune_model(m, 0.85, threshold=thresh) for m in wl.models]

    models = benchmark(prune)
    assert C.nnz_ratio(models) < 0.2


def bench_table14_quantize_all_models(benchmark, art):
    wl = art["textclf"]
    models = benchmark(lambda: [C.quantize_model(m) for m in wl.models])
    assert len(models) == 5


def bench_fig8_policy_replay(benchmark, art):
    """One full trace replay under the sharing-aware policy (the Fig. 8
    measurement loop)."""
    wl, res = art["textclf"], art["textclf_dedup"]
    ids = [m.model_id for m in wl.models]

    def replay():
        store = store_for(wl, ids, res)
        return simulate_serving(
            store, wl.serving_profile, ids,
            disk="HDD", pool_bytes=8 * GB, policy="Optimized-M",
        )

    rep = benchmark.pedantic(replay, rounds=3, iterations=1)
    assert 0 < rep.hit_ratio < 1
