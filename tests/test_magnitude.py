"""Magnitude statistics (core/magnitude.py)."""
import numpy as np
import pytest

from repro.core import magnitude as M


def test_q3_reflects_large_weights():
    mostly_small = np.concatenate([np.full(90, 0.01), np.full(10, 5.0)])
    assert M.block_magnitude(mostly_small, "q3") == pytest.approx(0.01, abs=1e-9)
    half_large = np.concatenate([np.full(50, 0.01), np.full(50, 5.0)])
    assert M.block_magnitude(half_large, "q3") == pytest.approx(5.0)


@pytest.mark.parametrize("stat,ref", [
    ("mean", np.mean),
    ("median", lambda a: np.percentile(a, 50)),
    ("q1", lambda a: np.percentile(a, 25)),
    ("q3", lambda a: np.percentile(a, 75)),
    ("max", np.max),
])
def test_stats_match_numpy(stat, ref):
    g = np.random.default_rng(0)
    v = g.normal(size=257)
    assert M.block_magnitude(v, stat) == pytest.approx(ref(np.abs(v)))


def test_magnitude_uses_absolute_values():
    v = np.array([-10.0, -10.0, -10.0, 1.0])
    assert M.block_magnitude(v, "q3") == pytest.approx(10.0)


def test_empty_block():
    assert M.block_magnitude(np.array([]), "q3") == 0.0


def test_unknown_stat():
    with pytest.raises(ValueError):
        M.block_magnitude(np.ones(4), "p99")


def test_magnitude_df_matches_driver(spark):
    from repro.core.blocks import matrix_to_df

    g = np.random.default_rng(1)
    m = g.normal(size=(8, 8))
    df = matrix_to_df(spark, "t", m, (4, 4))
    rows = M.magnitude_df(df, "q3").collect()
    assert len(rows) == 4
    for r in rows:
        block = m[
            r.block_row * 4 : r.block_row * 4 + 4, r.block_col * 4 : r.block_col * 4 + 4
        ]
        assert r.magnitude == pytest.approx(M.block_magnitude(block))


def test_magnitude_df_rejects_unknown_stat(spark):
    from repro.core.blocks import matrix_to_df

    df = matrix_to_df(spark, "t", np.zeros((2, 2)), (2, 2))
    with pytest.raises(ValueError):
        M.magnitude_df(df, "p99")
