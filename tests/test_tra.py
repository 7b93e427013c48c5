"""Tensor relational algebra vs. numpy and the DuckDB oracle.

Every operator is checked two ways: (1) dense result equals numpy; (2) the
matmul relational plan, unfolded to (i, j, v) triples, matches the DuckDB SQL
join+aggregate over the unfolded inputs — a genuinely relational oracle.
"""
import numpy as np
import pytest

from repro.core import blocks as B
from repro.core import tra
from repro.oracle import assert_equivalent


@pytest.mark.parametrize(
    "an,am,bm,block",
    [
        (4, 4, 4, (2, 2)),
        (6, 4, 5, (2, 2)),
        (5, 7, 3, (2, 3)),
        (3, 3, 3, (3, 3)),
        (8, 2, 8, (2, 2)),
    ],
)
def test_matmul_dense(spark, an, am, bm, block):
    g = np.random.default_rng(an * 100 + am)
    a = g.normal(size=(an, am))
    b = g.normal(size=(am, bm))
    adf = B.matrix_to_df(spark, "A", a, block)
    bdf = B.matrix_to_df(spark, "B", b, (block[1], block[0]))
    out = tra.matmul(adf, bdf, "C")
    np.testing.assert_allclose(B.df_to_matrix(out), a @ b, rtol=1e-10)


def test_matmul_oracle(spark):
    g = np.random.default_rng(7)
    a = g.normal(size=(6, 4))
    b = g.normal(size=(4, 5))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    bdf = B.matrix_to_df(spark, "B", b, (2, 2))
    out_coo = B.to_coo_df(tra.matmul(adf, bdf, "C"))
    assert_equivalent(
        out_coo,
        """
        SELECT a.i AS i, b.j AS j, SUM(a.v * b.v) AS v
        FROM a JOIN b ON a.j = b.i
        GROUP BY a.i, b.j
        """,
        a=B.to_coo_df(adf),
        b=B.to_coo_df(bdf),
    )


def test_add_oracle(spark):
    g = np.random.default_rng(8)
    a = g.normal(size=(4, 6))
    b = g.normal(size=(4, 6))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    bdf = B.matrix_to_df(spark, "B", b, (2, 2))
    out = tra.add(adf, bdf, "C")
    np.testing.assert_allclose(B.df_to_matrix(out), a + b)
    assert_equivalent(
        B.to_coo_df(out),
        "SELECT a.i AS i, a.j AS j, a.v + b.v AS v FROM a JOIN b ON a.i = b.i AND a.j = b.j",
        a=B.to_coo_df(adf),
        b=B.to_coo_df(bdf),
    )


def test_add_row_vector(spark):
    g = np.random.default_rng(9)
    a = g.normal(size=(6, 4))
    bias = g.normal(size=(1, 4))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    bdf = B.matrix_to_df(spark, "b", bias, (1, 2))
    out = tra.add_row_vector(adf, bdf, "C")
    np.testing.assert_allclose(B.df_to_matrix(out), a + bias)


def test_transpose(spark):
    g = np.random.default_rng(10)
    a = g.normal(size=(5, 3))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    out = tra.transpose(adf, "At")
    np.testing.assert_allclose(B.df_to_matrix(out), a.T)


@pytest.mark.parametrize("fn,ref", [
    ("relu", lambda x: np.maximum(x, 0)),
    ("sigmoid", lambda x: 1 / (1 + np.exp(-x))),
    ("tanh", np.tanh),
    ("identity", lambda x: x),
])
def test_transform(spark, fn, ref):
    g = np.random.default_rng(11)
    a = g.normal(size=(4, 6))
    adf = B.matrix_to_df(spark, "A", a, (2, 3))
    out = tra.transform(adf, fn, "C")
    np.testing.assert_allclose(B.df_to_matrix(out), ref(a), rtol=1e-12)


def test_transform_unknown_raises(spark):
    a = B.matrix_to_df(spark, "A", np.zeros((2, 2)), (2, 2))
    with pytest.raises(KeyError):
        tra.transform(a, "gelu", "C")


def test_softmax_rows(spark):
    g = np.random.default_rng(12)
    a = g.normal(size=(4, 6))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    out = B.df_to_matrix(tra.softmax_rows(adf, "S"))
    e = np.exp(a - a.max(axis=1, keepdims=True))
    np.testing.assert_allclose(out, e / e.sum(axis=1, keepdims=True), rtol=1e-12)
    np.testing.assert_allclose(out.sum(axis=1), np.ones(4))


def test_matmul_chain_oracle(spark):
    """(A@B)@C as one relational plan vs a two-join SQL aggregate."""
    g = np.random.default_rng(13)
    a = g.normal(size=(4, 3))
    b = g.normal(size=(3, 5))
    c = g.normal(size=(5, 2))
    adf = B.matrix_to_df(spark, "A", a, (2, 2))
    bdf = B.matrix_to_df(spark, "B", b, (2, 2))
    cdf = B.matrix_to_df(spark, "C", c, (2, 2))
    out = tra.matmul(tra.matmul(adf, bdf, "AB"), cdf, "ABC")
    np.testing.assert_allclose(B.df_to_matrix(out), a @ b @ c, rtol=1e-10)
    assert_equivalent(
        B.to_coo_df(out),
        """
        WITH ab AS (
          SELECT a.i AS i, b.j AS j, SUM(a.v * b.v) AS v
          FROM a JOIN b ON a.j = b.i GROUP BY a.i, b.j
        )
        SELECT ab.i AS i, c.j AS j, SUM(ab.v * c.v) AS v
        FROM ab JOIN c ON ab.j = c.i GROUP BY ab.i, c.j
        """,
        a=B.to_coo_df(adf),
        b=B.to_coo_df(bdf),
        c=B.to_coo_df(cdf),
    )
