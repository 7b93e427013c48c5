"""Benchmarks for Tables 11/12/13: packing algorithms and online packing.

Table 12 *is* a latency table — these benchmarks regenerate its cells.
"""
import pytest

from repro.models import zoo
from repro.paging import packing as P
from repro.paging.online import online_packing


@pytest.fixture(scope="module")
def tb_300x300():
    md = zoo.make_textclf_metadata_300x300(64 * 2**20)
    return {f"t{k}": v for k, v in md.tensor_blocks.items()}, md.blocks_per_page


@pytest.mark.parametrize("alg", list(P.ALGORITHMS))
def bench_table12_textclf_100x10000(benchmark, textclf_tb, alg):
    result = benchmark(lambda: P.ALGORITHMS[alg](textclf_tb, 8))
    assert result.n_pages() > 0


@pytest.mark.parametrize("alg", list(P.ALGORITHMS))
def bench_table12_textclf_300x300(benchmark, tb_300x300, alg):
    tb, l = tb_300x300
    result = benchmark.pedantic(lambda: P.ALGORITHMS[alg](tb, l), rounds=3, iterations=1)
    assert result.n_pages() > 0


def bench_table11_w2v_two_stage(benchmark, w2v_tb):
    result = benchmark(lambda: P.pack_two_stage(w2v_tb, 8))
    assert 95 <= result.n_pages() <= 105


def bench_table13_online_packing(benchmark, textclf_tb):
    steps = benchmark.pedantic(lambda: online_packing(textclf_tb, 8), rounds=1, iterations=1)
    assert len(steps) == 5
