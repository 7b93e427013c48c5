"""Unit tests for the tensor-block representation (core/blocks.py)."""
import numpy as np
import pytest

from repro.core import blocks as B


@pytest.mark.parametrize(
    "shape,block",
    [
        ((4, 4), (2, 2)),
        ((6, 4), (2, 2)),
        ((5, 7), (2, 3)),
        ((1, 1), (1, 1)),
        ((8, 8), (8, 8)),
        ((10, 3), (4, 2)),
        ((3, 10), (2, 4)),
        ((64, 32), (64, 32)),
        ((100, 100), (30, 30)),
    ],
)
def test_blockify_roundtrip(shape, block):
    g = np.random.default_rng(0)
    m = g.normal(size=shape)
    bs = B.blockify(m, block)
    np.testing.assert_array_equal(B.unblockify(bs), m)


def test_blockify_grid_shape():
    m = np.zeros((10, 6))
    bs = B.blockify(m, (4, 4))
    assert B.grid_shape(bs) == (3, 2)
    assert bs[(2, 1)].shape == (2, 2)  # trailing edge block


def test_blockify_rejects_bad_input():
    with pytest.raises(ValueError):
        B.blockify(np.zeros(3), (1, 1))
    with pytest.raises(ValueError):
        B.blockify(np.zeros((2, 2)), (0, 1))


def test_unblockify_empty():
    assert B.unblockify({}).shape == (0, 0)


def test_blocks_to_pdf_schema():
    m = np.arange(12.0).reshape(3, 4)
    pdf = B.blocks_to_pdf("t", B.blockify(m, (2, 2)))
    assert set(pdf.columns) == {"tensor_id", "block_row", "block_col", "nrows", "ncols", "values"}
    assert len(pdf) == 4
    assert (pdf["tensor_id"] == "t").all()


def test_block_ids_ordering():
    m = np.zeros((4, 4))
    bs = B.blockify(m, (2, 2))
    ids = B.block_ids("t", bs)
    assert [i.position for i in ids] == [(0, 0), (0, 1), (1, 0), (1, 1)]
    assert ids[0].tensor_id == "t"


@pytest.mark.parametrize("shape,block", [((6, 6), (2, 3)), ((5, 5), (2, 2))])
def test_matrix_df_roundtrip(spark, shape, block):
    g = np.random.default_rng(1)
    m = g.normal(size=shape)
    df = B.matrix_to_df(spark, "t", m, block)
    np.testing.assert_allclose(B.df_to_matrix(df), m)


def test_df_to_matrix_rejects_multiple_tensors(spark):
    m = np.zeros((2, 2))
    df = B.matrix_to_df(spark, "a", m, (2, 2)).union(B.matrix_to_df(spark, "b", m, (2, 2)))
    with pytest.raises(ValueError):
        B.df_to_matrix(df)


def test_to_coo_df_matches_numpy(spark):
    g = np.random.default_rng(2)
    m = g.normal(size=(5, 7))
    df = B.matrix_to_df(spark, "t", m, (2, 3))
    coo = B.to_coo_df(df).toPandas()
    rebuilt = np.zeros_like(m)
    for row in coo.itertuples():
        rebuilt[int(row.i), int(row.j)] = row.v
    np.testing.assert_allclose(rebuilt, m)


def test_to_coo_df_empty(spark):
    df = spark.createDataFrame([], schema=B.BLOCK_SCHEMA)
    assert B.to_coo_df(df).count() == 0
