"""Dedup index engine (Alg. 1) and its matchers on small synthetic inputs."""
import numpy as np
import pytest

from repro.core import dedup_index as DI
from repro.core.lsh import L2LSH, MinHash
from repro.models.zoo import Evaluator, ModelSpec, Workload


class _ConstEval(Evaluator):
    def accuracy(self, model, blocks):
        return 1.0


class _SumEval(Evaluator):
    """Accuracy falls with total |delta| from the original blocks — lets
    tests trigger the threshold stop deterministically."""

    def __init__(self, originals):
        self._orig = originals

    def accuracy(self, model, blocks):
        err = 0.0
        for key, arr in blocks.items():
            err += float(np.abs(arr - self._orig[model.model_id][key]).sum())
        return max(0.0, 1.0 - 0.1 * err)


def _tiny_workload(n_models=3, dim=8, check_every=2, threshold=0.5, evaluator=None):
    """Models of 4 blocks each: block (0,0)/(0,1) shared, rest private."""
    g = np.random.default_rng(0)
    base = {k: g.normal(size=(2, dim // 2)) for k in [(0, 0), (0, 1)]}
    models = []
    for i in range(n_models):
        blocks = dict(base)
        blocks[(1, 0)] = g.normal(size=(2, dim // 2)) + 10 * i
        blocks[(1, 1)] = g.normal(size=(2, dim // 2)) - 10 * i
        models.append(ModelSpec(model_id=f"m{i}", tensors={"w": {k: v.copy() for k, v in blocks.items()}}))
    originals = {m.model_id: m.all_blocks() for m in models}
    return Workload(
        name="tiny",
        models=models,
        blocks_per_page=2,
        logical_block_bytes=8,
        accuracy_threshold=threshold,
        check_every=check_every,
        evaluator=evaluator or _SumEval(originals),
    )


def test_exact_dedup_groups_identical_blocks():
    wl = _tiny_workload()
    res = DI.dedup_mistique_exact(wl)
    # 2 shared + 2 private x 3 models = 8 distinct of 12 logical
    assert res.n_logical_blocks == 12
    assert res.n_distinct() == 8


def test_exact_dedup_mapping_consistency():
    wl = _tiny_workload()
    res = DI.dedup_mistique_exact(wl)
    for model in wl.models:
        f = res.mapping[model.model_id]
        assert len(f) == 4
        for ref, did in f.items():
            np.testing.assert_array_equal(
                res.distinct[did].values, model.all_blocks()[ref]
            )


def test_owners_and_tensor_lists():
    wl = _tiny_workload()
    res = DI.dedup_mistique_exact(wl)
    owners = res.owners()
    shared = [did for did, o in owners.items() if len(o) == 3]
    assert len(shared) == 2
    lists = res.tensor_block_lists()
    assert set(lists) == {"m0/w", "m1/w", "m2/w"}
    for lst in lists.values():
        assert len(lst) == 4


def test_lsh_dedup_merges_near_duplicates():
    wl = _tiny_workload(evaluator=_ConstEval())
    # perturb m1's shared blocks slightly
    m1 = wl.models[1].tensors["w"]
    m1[(0, 0)] = m1[(0, 0)] + 1e-9
    res = DI.dedup_proposed(wl, check_accuracy=False)
    assert res.n_distinct() == 8


def test_threshold_stop_keeps_remaining_distinct():
    """A model whose replacements hurt accuracy stops mid-way; the remaining
    blocks stay distinct (no replacement, no rollback)."""
    wl = _tiny_workload(threshold=0.05)
    # Make m1's shared copies differ enough to hurt _SumEval; a wide-bucket
    # LSH guarantees they still collide with the representatives.
    for key in [(0, 0), (0, 1)]:
        wl.models[1].tensors["w"][key] = wl.models[1].tensors["w"][key] + 0.2
    wide = L2LSH(dim=8, n_hashes=24, bucket_width=50.0, seed=7)
    res = DI.dedup_proposed(wl, check_accuracy=True, lsh=wide)
    assert res.stopped["m1"]
    assert res.accuracy_before["m1"] - res.accuracy_after["m1"] > 0.05


def test_no_stop_when_exact_duplicates():
    wl = _tiny_workload(threshold=0.01)
    res = DI.dedup_proposed(wl, check_accuracy=True)
    # identical shared copies: replacement is a no-op, accuracy never drops
    assert not any(res.stopped.values())
    assert res.n_distinct() == 8


def test_accuracy_drop_computation():
    wl = _tiny_workload()
    res = DI.dedup_proposed(wl)
    drops = res.accuracy_drop()
    assert set(drops) == {"m0", "m1", "m2"}
    assert all(d >= -1e-9 for d in drops.values())


def test_logical_bytes():
    wl = _tiny_workload()
    res = DI.dedup_mistique_exact(wl)
    before, after = res.logical_bytes(1000)
    assert before == 12_000 and after == 8_000


def test_run_dedup_write_order():
    wl = _tiny_workload()
    res = DI.run_dedup(wl, DI.ExactMatcher(), method="x", order="write", check_accuracy=False)
    # first distinct blocks come from m0 in position order
    assert res.distinct[0].position == (0, 0)
    assert res.distinct[0].rep_model == "m0"


def test_run_dedup_unknown_order():
    wl = _tiny_workload()
    with pytest.raises(ValueError):
        DI.run_dedup(wl, DI.ExactMatcher(), method="x", order="random", check_accuracy=False)


# -- matchers ---------------------------------------------------------------


def test_lsh_matcher_hint_bypasses_computation():
    lsh = L2LSH(dim=4, n_hashes=4, bucket_width=2.0, seed=0)
    m = DI.LSHMatcher(lsh)
    v = np.ones(4)
    m.insert(v, 7, hint="sig")
    assert m.find(np.zeros(4), hint="sig") == 7  # hint wins over values
    assert m.find(v) != 7 or lsh.signature(v) == "sig"


def test_pairwise_matcher_threshold():
    m = DI.PairwiseMatcher(distance_threshold=1.0)
    m.insert(np.zeros(4), 1)
    assert m.find(np.full(4, 0.4)) == 1  # distance 0.8
    assert m.find(np.full(4, 2.0)) is None


def test_pairwise_matcher_first_match_wins():
    m = DI.PairwiseMatcher(distance_threshold=10.0)
    m.insert(np.zeros(4), 1)
    m.insert(np.ones(4), 2)
    assert m.find(np.ones(4)) == 1  # linear scan returns first within range


def test_minhash_matcher_bands():
    mh = MinHash(n_perms=32, seed=3)
    m = DI.MinHashMatcher(mh, band=4, jaccard_threshold=0.9)
    g = np.random.default_rng(3)
    v = g.normal(size=64)
    m.insert(v, 5)
    assert m.find(v.copy()) == 5
    assert m.find(g.normal(size=64)) is None


def test_measure_query_time_positive():
    m = DI.ExactMatcher()
    blocks = [np.random.default_rng(i).normal(size=16) for i in range(8)]
    for i, b in enumerate(blocks):
        m.insert(b, i)
    t = DI.measure_query_seconds_per_block(m, blocks, n_probe=8)
    assert t > 0


# -- Spark-assisted path ----------------------------------------------------


def test_spark_stats_match_driver(spark):
    wl = _tiny_workload(evaluator=_ConstEval())
    lsh = L2LSH(dim=8, **DI.DEFAULT_LSH)
    hints, mags = DI.spark_block_stats(spark, wl, lsh)
    assert len(hints) == 12 and len(mags) == 12
    from repro.core.magnitude import block_magnitude

    for model in wl.models:
        for (tname, pos), arr in model.all_blocks().items():
            key = (model.model_id, tname, pos[0], pos[1])
            assert hints[key] == lsh.signature(arr.ravel())
            assert mags[key] == pytest.approx(block_magnitude(arr))


def test_dedup_proposed_spark_path_equivalent(spark):
    wl = _tiny_workload(evaluator=_ConstEval())
    a = DI.dedup_proposed(wl, check_accuracy=False)
    b = DI.dedup_proposed(wl, spark=spark, check_accuracy=False)
    assert a.n_distinct() == b.n_distinct()
    assert a.tensor_block_lists() == b.tensor_block_lists()
