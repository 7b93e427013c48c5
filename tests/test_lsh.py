"""L2 LSH, MinHash and exact-hash behaviour (core/lsh.py)."""
import numpy as np
import pytest

from repro.core import lsh as L


@pytest.fixture(scope="module")
def l2():
    return L.L2LSH(dim=64, n_hashes=12, bucket_width=4.0, seed=1)


def test_l2lsh_deterministic(l2):
    v = np.random.default_rng(0).normal(size=64)
    assert l2.signature(v) == l2.signature(v)
    again = L.L2LSH(dim=64, n_hashes=12, bucket_width=4.0, seed=1)
    assert again.signature(v) == l2.signature(v)


def test_l2lsh_seed_changes_signature(l2):
    v = np.random.default_rng(0).normal(size=64)
    other = L.L2LSH(dim=64, n_hashes=12, bucket_width=4.0, seed=2)
    assert other.signature(v) != l2.signature(v)


def test_l2lsh_identical_vectors_collide(l2):
    v = np.random.default_rng(1).normal(size=64)
    assert l2.signature(v) == l2.signature(v.copy())


def test_l2lsh_near_vectors_mostly_collide(l2):
    g = np.random.default_rng(2)
    hits = 0
    for _ in range(50):
        v = g.normal(size=64)
        assert_sig = l2.signature(v) == l2.signature(v + 1e-4 * g.normal(size=64))
        hits += assert_sig
    assert hits >= 45  # tiny perturbations keep the signature


def test_l2lsh_far_vectors_do_not_collide(l2):
    g = np.random.default_rng(3)
    for _ in range(50):
        a, b = g.normal(size=64), g.normal(size=64)
        if np.linalg.norm(a - b) > 8:
            assert l2.signature(a) != l2.signature(b)


def test_l2lsh_batch_matches_single(l2):
    g = np.random.default_rng(4)
    m = g.normal(size=(10, 64))
    assert l2.signatures(m) == [l2.signature(row) for row in m]


def test_l2lsh_dim_check(l2):
    with pytest.raises(ValueError):
        l2.signature(np.zeros(32))


def test_l2lsh_bad_params():
    with pytest.raises(ValueError):
        L.L2LSH(dim=0)
    with pytest.raises(ValueError):
        L.L2LSH(dim=4, n_hashes=0)
    with pytest.raises(ValueError):
        L.L2LSH(dim=4, bucket_width=-1)


# -- MinHash ---------------------------------------------------------------


def test_minhash_identical_blocks_equal_signature():
    mh = L.MinHash(n_perms=32, seed=5)
    v = np.random.default_rng(5).normal(size=128)
    assert mh.signature(v) == mh.signature(v.copy())


def test_minhash_detects_similar_after_discretization():
    mh = L.MinHash(n_perms=64, decimals=2, seed=6)
    g = np.random.default_rng(6)
    v = g.normal(size=256)
    w = v + 1e-6  # below discretization resolution for most entries
    est = L.MinHash.jaccard_estimate(mh.minhash(v), mh.minhash(w))
    assert est > 0.9


def test_minhash_dissimilar_low_jaccard():
    mh = L.MinHash(n_perms=64, seed=7)
    g = np.random.default_rng(7)
    est = L.MinHash.jaccard_estimate(
        mh.minhash(g.normal(size=256)), mh.minhash(g.normal(size=256))
    )
    assert est < 0.2


def test_minhash_band_prefix():
    mh = L.MinHash(n_perms=16, seed=8)
    v = np.random.default_rng(8).normal(size=64)
    full = mh.signature(v)
    band = mh.signature(v, band=4)
    assert full.startswith(band)
    assert len(band.split(",")) == 4


def test_minhash_bad_params():
    with pytest.raises(ValueError):
        L.MinHash(n_perms=0)


# -- exact hash ------------------------------------------------------------


def test_exact_hash_equality_and_sensitivity():
    v = np.random.default_rng(9).normal(size=64)
    assert L.exact_hash(v) == L.exact_hash(v.copy())
    w = v.copy()
    w[0] += 1e-15
    assert L.exact_hash(v) != L.exact_hash(w)


def test_l2_distance():
    assert L.l2_distance(np.array([0.0, 0.0]), np.array([3.0, 4.0])) == pytest.approx(5.0)


# -- Spark paths -----------------------------------------------------------


def test_signature_df_matches_driver(spark, l2):
    from repro.core.blocks import matrix_to_df

    g = np.random.default_rng(10)
    m = g.normal(size=(16, 16))  # blocks of 8x8 -> 64 values
    df = matrix_to_df(spark, "t", m, (8, 8))
    rows = L.signature_df(df, l2).collect()
    assert len(rows) == 4
    for r in rows:
        block = m[
            r.block_row * 8 : r.block_row * 8 + 8, r.block_col * 8 : r.block_col * 8 + 8
        ]
        assert r.signature == l2.signature(block.ravel())


def test_exact_hash_df_matches_driver(spark):
    from repro.core.blocks import matrix_to_df

    g = np.random.default_rng(11)
    m = g.normal(size=(8, 8))
    df = matrix_to_df(spark, "t", m, (4, 4))
    rows = L.exact_hash_df(df).collect()
    assert len(rows) == 4
    for r in rows:
        block = m[
            r.block_row * 4 : r.block_row * 4 + 4, r.block_col * 4 : r.block_col * 4 + 4
        ]
        assert r.signature == L.exact_hash(block.ravel())
