"""Benchmarks for Tables 4/5: the proposed dedup pipeline + page accounting."""
from repro.core import dedup_index as DI
from repro.paging import packing as P


def bench_table04_full_dedup_pipeline(benchmark, art):
    """Alg. 1 over all 5 text classifiers with accuracy validation."""
    wl = art["textclf"]
    res = benchmark.pedantic(lambda: DI.dedup_proposed(wl), rounds=1, iterations=1)
    assert 600 <= res.n_distinct() <= 750


def bench_table05_cover_and_refcounts(benchmark, art, textclf_tb):
    packed = P.pack_two_stage(textclf_tb, art["textclf"].blocks_per_page)

    def refs():
        return packed.ref_counts(textclf_tb)

    counts = benchmark(refs)
    assert sum(1 for c in counts.values() if c == 5) >= 50
