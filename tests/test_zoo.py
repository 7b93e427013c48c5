"""Planted structure invariants of the synthetic model zoo."""
import numpy as np
import pytest

from repro.models import zoo


class TestTextClassification:
    def test_model_count_and_blocks(self, textclf_wl):
        assert len(textclf_wl.models) == 5
        for m in textclf_wl.models:
            assert m.n_blocks() == zoo.N_BLOCKS_PER_MODEL == 512

    def test_position_classes_partition(self):
        classes = [zoo._A_POSITIONS, zoo._B_POSITIONS, zoo._C_POSITIONS, zoo._D_POSITIONS, zoo._E_POSITIONS]
        sizes = [len(c) for c in classes]
        assert sizes == [408, 48, 40, 8, 8]
        all_pos = sorted(p for c in classes for p in c)
        assert all_pos == list(range(512))

    def test_exact_positions_bitwise_identical(self, textclf_wl):
        m0 = textclf_wl.models[0].tensors["embedding"]
        for p in list(textclf_wl.exact_positions)[:20]:
            key = zoo.linear_to_key(p)
            for m in textclf_wl.models[1:]:
                np.testing.assert_array_equal(m.tensors["embedding"][key], m0[key])

    def test_exact_position_count_matches_table9(self, textclf_wl):
        # 130 positions x 4 duplicate copies = 520 removable: 2560 -> 2040
        assert len(textclf_wl.exact_positions) == 130

    def test_shared_classes_are_near_identical(self, textclf_wl):
        m0 = textclf_wl.models[0].tensors["embedding"]
        m2 = textclf_wl.models[2].tensors["embedding"]  # model 3 shares B
        for p in zoo._B_POSITIONS[:5]:
            key = zoo.linear_to_key(p)
            assert np.linalg.norm(m2[key] - m0[key]) < 0.1

    def test_private_blocks_are_far(self, textclf_wl):
        m0 = textclf_wl.models[0].tensors["embedding"]
        m3 = textclf_wl.models[3].tensors["embedding"]  # model 4 private at B
        for p in zoo._B_POSITIONS[:5]:
            key = zoo.linear_to_key(p)
            assert np.linalg.norm(m3[key] - m0[key]) > 1.0

    def test_e_blocks_high_magnitude(self, textclf_wl):
        from repro.core.magnitude import block_magnitude

        m0 = textclf_wl.models[0].tensors["embedding"]
        e_mag = min(
            block_magnitude(m0[zoo.linear_to_key(p)]) for p in zoo._E_POSITIONS
        )
        a_mag = max(
            block_magnitude(m0[zoo.linear_to_key(p)]) for p in zoo._A_POSITIONS[:50]
        )
        assert e_mag > 3 * a_mag  # magnitude ordering visits E last

    def test_base_accuracy_near_table4(self, textclf_wl):
        targets = [0.8501, 0.8125, 0.8469, 0.9038, 0.9480]
        for m, target in zip(textclf_wl.models, targets):
            acc = textclf_wl.evaluator.accuracy(m, m.all_blocks())
            assert abs(acc - target) < 0.03

    def test_sentinels_flip_when_e_merged(self, textclf_wl):
        """Merging the E blocks of model 3 drops accuracy by ~the sentinel
        count — the planted mechanism behind Tables 4/10."""
        wl = textclf_wl
        model = wl.models[2]
        blocks = dict(model.all_blocks())
        a0 = wl.evaluator.accuracy(model, blocks)
        rep = wl.models[0].tensors["embedding"]
        for p in zoo._E_POSITIONS:
            key = zoo.linear_to_key(p)
            blocks[("embedding", key)] = rep[key]
        a1 = wl.evaluator.accuracy(model, blocks)
        assert 0.025 <= a0 - a1 <= 0.05

    def test_merging_shared_blocks_is_harmless(self, textclf_wl):
        wl = textclf_wl
        model = wl.models[1]
        blocks = dict(model.all_blocks())
        a0 = wl.evaluator.accuracy(model, blocks)
        rep = wl.models[0].tensors["embedding"]
        for p in zoo._A_POSITIONS:
            key = zoo.linear_to_key(p)
            blocks[("embedding", key)] = rep[key]
        a1 = wl.evaluator.accuracy(model, blocks)
        assert abs(a0 - a1) <= 0.005

    def test_incremental_session_matches_full_eval(self, textclf_wl):
        wl = textclf_wl
        model = wl.models[3]
        session = wl.evaluator.session(model)
        blocks = dict(model.all_blocks())
        rep = wl.models[0].tensors["embedding"]
        for p in list(zoo._E_POSITIONS)[:4]:
            key = zoo.linear_to_key(p)
            session.replace("embedding", key, rep[key])
            blocks[("embedding", key)] = rep[key]
        assert session.accuracy() == pytest.approx(
            wl.evaluator.accuracy(model, blocks), abs=1e-12
        )

    def test_determinism(self):
        a = zoo.make_text_classification_workload(seed=123)
        b = zoo.make_text_classification_workload(seed=123)
        ka = a.models[0].tensors["embedding"][(0, 0)]
        kb = b.models[0].tensors["embedding"][(0, 0)]
        np.testing.assert_array_equal(ka, kb)


class TestWord2Vec:
    def test_model_count(self, w2v_wl):
        assert len(w2v_wl.models) == 6
        for m in w2v_wl.models:
            assert m.n_blocks() == 512

    def test_private_positions_unaligned(self):
        # Deliberately not multiples of the 8-block page; Fig. 3 effect.
        assert len(zoo._W2V_PRIVATE_POSITIONS) == 52
        assert any(p % 8 != 0 for p, _ in [(s, l) for s, l in zoo._W2V_PRIVATE_RUNS])

    def test_shared_blocks_near_identical(self, w2v_wl):
        m0, m5 = w2v_wl.models[0], w2v_wl.models[5]
        private = set(zoo._W2V_PRIVATE_POSITIONS)
        for p in range(0, 100, 17):
            if p in private:
                continue
            key = zoo.linear_to_key(p)
            d = np.linalg.norm(m0.tensors["embedding"][key] - m5.tensors["embedding"][key])
            assert d < 0.01

    def test_fidelity_evaluator_full_marks_initially(self, w2v_wl):
        for m in w2v_wl.models:
            assert w2v_wl.evaluator.accuracy(m, m.all_blocks()) == 1.0


class TestFFNN:
    def test_w1_bitwise_shared(self, ffnn_wl):
        m0 = ffnn_wl.models[0].tensors["W1"]
        for m in ffnn_wl.models[1:]:
            for key in list(m0)[:10]:
                np.testing.assert_array_equal(m.tensors["W1"][key], m0[key])

    def test_block_counts(self, ffnn_wl):
        for m in ffnn_wl.models:
            assert len(m.tensors["W1"]) == zoo.FFNN_W1_BLOCKS
            assert len(m.tensors["W2"]) == zoo.FFNN_W2_BLOCKS

    def test_w2_private(self, ffnn_wl):
        a = ffnn_wl.models[0].tensors["W2"]
        b = ffnn_wl.models[1].tensors["W2"]
        key = next(iter(a))
        assert np.linalg.norm(a[key] - b[key]) > 1.0


class TestMetadata300x300:
    @pytest.mark.parametrize("mb,l", [(64, 93), (32, 46)])
    def test_blocks_per_page(self, mb, l):
        md = zoo.make_textclf_metadata_300x300(mb * 2**20)
        assert md.blocks_per_page == l

    def test_tensor_sizes(self):
        md = zoo.make_textclf_metadata_300x300(64 * 2**20)
        assert md.n_models == 5
        for m in range(5):
            assert len(md.tensor_blocks[m]) == 6668

    def test_sharing_structure_scales(self):
        md = zoo.make_textclf_metadata_300x300(64 * 2**20)
        from repro.paging.packing import owners_map

        owners = owners_map({f"t{k}": v for k, v in md.tensor_blocks.items()})
        by5 = sum(1 for o in owners.values() if len(o) == 5)
        assert 5000 < by5 < 5600  # ~408/512 of 6668
