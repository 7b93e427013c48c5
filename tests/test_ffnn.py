"""FFNN-as-relational-algebra vs. the numpy reference (paper Fig. 1)."""
import numpy as np
import pytest

from repro.core import blocks as B
from repro.core import ffnn


def _mats(seed, dims, acts):
    g = np.random.default_rng(seed)
    mats = []
    for i in range(len(dims) - 1):
        w = g.normal(size=(dims[i], dims[i + 1]))
        b = g.normal(size=dims[i + 1])
        mats.append((w, b, acts[i]))
    return mats


def test_numpy_forward_known_values():
    w = np.array([[1.0, 0.0], [0.0, 1.0]])
    out = ffnn.numpy_ffnn_forward(np.array([[1.0, -2.0]]), [(w, None, "relu")])
    np.testing.assert_array_equal(out, [[1.0, 0.0]])


def test_numpy_forward_softmax_sums_to_one():
    mats = _mats(0, [4, 3, 2], ["tanh", "softmax"])
    out = ffnn.numpy_ffnn_forward(np.random.default_rng(1).normal(size=(5, 4)), mats)
    np.testing.assert_allclose(out.sum(axis=1), np.ones(5))


def test_numpy_forward_unknown_activation():
    with pytest.raises(ValueError):
        ffnn.numpy_ffnn_forward(np.zeros((1, 2)), [(np.zeros((2, 2)), None, "swish")])


@pytest.mark.parametrize("acts", [["identity"], ["relu"], ["sigmoid"], ["tanh"]])
def test_single_layer_spark_matches_numpy(spark, acts):
    mats = _mats(3, [4, 3], acts)
    x = np.random.default_rng(4).normal(size=(6, 4))
    layers = ffnn.layers_from_numpy(spark, "m", mats, (2, 2))
    xdf = B.matrix_to_df(spark, "x", x, (2, 2))
    out = ffnn.ffnn_forward(xdf, layers, "out")
    np.testing.assert_allclose(
        B.df_to_matrix(out), ffnn.numpy_ffnn_forward(x, mats), rtol=1e-10
    )


def test_two_layer_network_spark(spark):
    """The paper's FFNN: relu hidden layer + identity output layer."""
    mats = _mats(5, [6, 4, 2], ["relu", "identity"])
    x = np.random.default_rng(6).normal(size=(5, 6))
    layers = ffnn.layers_from_numpy(spark, "m", mats, (2, 2))
    xdf = B.matrix_to_df(spark, "x", x, (2, 2))
    out = ffnn.ffnn_forward(xdf, layers, "out")
    np.testing.assert_allclose(
        B.df_to_matrix(out), ffnn.numpy_ffnn_forward(x, mats), rtol=1e-10
    )


def test_softmax_output_layer_spark(spark):
    mats = _mats(7, [4, 4, 2], ["tanh", "softmax"])
    x = np.random.default_rng(8).normal(size=(4, 4))
    layers = ffnn.layers_from_numpy(spark, "m", mats, (2, 2))
    out = ffnn.ffnn_forward(B.matrix_to_df(spark, "x", x, (2, 2)), layers, "out")
    np.testing.assert_allclose(
        B.df_to_matrix(out), ffnn.numpy_ffnn_forward(x, mats), rtol=1e-10
    )


def test_embedding_inference_one_hot(spark):
    """Word2Vec inference (Sec. 7.1.1): one-hot batch times embedding."""
    g = np.random.default_rng(9)
    emb = g.normal(size=(8, 4))
    ids = [3, 1, 7]
    x = np.zeros((3, 8))
    x[np.arange(3), ids] = 1.0
    layers = ffnn.layers_from_numpy(spark, "w2v", [(emb, None, "identity")], (2, 2))
    out = ffnn.ffnn_forward(B.matrix_to_df(spark, "x", x, (2, 2)), layers, "e")
    np.testing.assert_allclose(B.df_to_matrix(out), emb[ids], rtol=1e-12)
