"""Benchmarks for Tables 9/10: per-block query latency of each index and the
baseline index builds (the Table 9 'Query Time' column, measured)."""
import numpy as np
import pytest

from repro.core import dedup_index as DI
from repro.core.lsh import L2LSH, MinHash
from repro.models import zoo


@pytest.fixture(scope="module")
def probe_blocks(art):
    g = np.random.default_rng(0)
    blocks = [v for m in art["textclf"].models for v in m.tensors["embedding"].values()]
    return [blocks[i] for i in g.integers(0, len(blocks), size=32)]


def _built_matcher(art, kind):
    res = art["textclf_dedup"]
    dim = zoo.PHYS_BLOCK_VALUES
    m = {
        "exact": DI.ExactMatcher(),
        "lsh": DI.LSHMatcher(L2LSH(dim=dim, **DI.DEFAULT_LSH)),
        "minhash": DI.MinHashMatcher(MinHash(n_perms=384)),
        "pairwise": DI.PairwiseMatcher(DI.DEFAULT_PAIRWISE_THRESHOLD),
    }[kind]
    for d in res.distinct:
        m.insert(d.values, d.id)
    return m


@pytest.mark.parametrize("kind", ["exact", "lsh", "minhash", "pairwise"])
def bench_table09_query_per_block(benchmark, art, probe_blocks, kind):
    matcher = _built_matcher(art, kind)

    def probe():
        for b in probe_blocks:
            matcher.find(b)

    benchmark(probe)


def bench_table10_mistique_exact_build(benchmark, art):
    res = benchmark.pedantic(
        lambda: DI.dedup_mistique_exact(art["textclf"]), rounds=1, iterations=1
    )
    assert res.n_distinct() == 2040
