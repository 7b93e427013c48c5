"""Spark-side equivalence classes and per-class packing (paging/equivalence.py)."""
import pytest

from repro.paging import equivalence as E
from repro.paging import packing as P


@pytest.fixture(scope="module")
def tb():
    return {"t1": [1, 2, 3, 4, 5], "t2": [1, 2, 6, 7], "t3": [1, 8]}


def test_tensor_blocks_df(spark, tb):
    df = E.tensor_blocks_df(spark, tb)
    assert df.count() == 11
    assert set(df.columns) == {"tensor_key", "block_id", "rank"}


def test_equivalence_classes_df_matches_driver(spark, tb):
    rows = E.equivalence_classes_df(E.tensor_blocks_df(spark, tb)).collect()
    got = {int(r.block_id): frozenset(r.owner_key.split("|")) for r in rows}
    assert got == P.owners_map(tb)


def test_pack_classes_spark_matches_greedy1(spark, tb):
    pages = E.pack_classes_spark(spark, tb, l=2)
    driver = P.pack_greedy1(tb, 2)
    assert sorted(map(frozenset, pages)) == sorted(driver.page_sets())


def test_pack_classes_spark_respects_capacity(spark, tb):
    for page in E.pack_classes_spark(spark, tb, l=3):
        assert len(page) <= 3


def test_pack_classes_spark_on_dedup_output(spark, textclf_dedup, textclf_wl):
    """The distributed stage-1 packer agrees with the driver packer on the
    real dedup output (one applyInPandas task per equivalence class)."""
    tb = textclf_dedup.tensor_block_lists()
    l = textclf_wl.blocks_per_page
    pages = E.pack_classes_spark(spark, tb, l)
    driver = P.pack_greedy1(tb, l)
    assert len(pages) == driver.n_pages()
    assert sorted(map(frozenset, pages)) == sorted(driver.page_sets())
