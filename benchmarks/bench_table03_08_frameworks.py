"""Benchmarks for Tables 3/8: framework cost model + netsDB serving columns."""
from repro.serving import frameworks as FW
from repro.serving.simulator import simulate_serving, store_for

GB = 2**30


def bench_table03_tf_matmul_grid(benchmark):
    """All 18 TF cells of Table 3's matmul block."""

    def grid():
        out = []
        for n in (3, 6, 12):
            for fw in (FW.TF_CPU, FW.TF_GPU):
                for src, blobs in (("mem", 0), ("file", 0), ("db", 40_000)):
                    out.append(
                        FW.serve_matmul(
                            fw, n_models=n, model_bytes=4 * GB,
                            input_bytes=800 * 2**20, flops_per_model=1e11,
                            source=src, n_blobs=blobs,
                        )
                    )
        return out

    results = benchmark(grid)
    assert sum(r.failed for r in results) == 12  # 6- and 12-model rows fail


def bench_table03_netsdb_serving(benchmark, art):
    wl, res = art["w2v"], art["w2v_dedup"]
    ids = [m.model_id for m in wl.models[:3]]

    def serve():
        store = store_for(wl, ids, res)
        return simulate_serving(
            store, wl.serving_profile, ids,
            disk="SSD", pool_bytes=15 * GB, policy="Optimized-M",
        )

    rep = benchmark.pedantic(serve, rounds=3, iterations=1)
    assert rep.latency_seconds > 0


def bench_table08_tf_ffnn_grid(benchmark):
    def grid():
        out = []
        for n in (2, 3):
            for fw in (FW.TF_CPU_DENSE, FW.TF_GPU):
                for src, blobs in (("mem", 0), ("file", 0), ("db", 1000)):
                    out.append(
                        FW.serve_matmul(
                            fw, n_models=n, model_bytes=int(4.9 * GB),
                            input_bytes=int(4.78 * GB), flops_per_model=1.2e12,
                            source=src, n_blobs=blobs,
                        )
                    )
        return out

    results = benchmark(grid)
    assert any(r.failed for r in results)
