"""Integration: the four index methods on the planted paper workloads."""
import pytest

from repro.core import dedup_index as DI


class TestProposedOnTextClf:
    def test_distinct_count_near_paper(self, textclf_dedup):
        # Paper Table 9: proposed 662 of 2545; planted structure: 696.
        assert 630 <= textclf_dedup.n_distinct() <= 720
        assert textclf_dedup.n_logical_blocks == 2560

    def test_drop_pattern(self, textclf_dedup):
        drops = textclf_dedup.accuracy_drop()
        assert drops["textclf-1"] == pytest.approx(0.0, abs=1e-9)
        assert drops["textclf-2"] == pytest.approx(0.0, abs=0.005)
        assert 0.025 <= drops["textclf-3"] <= 0.05
        assert 0.025 <= drops["textclf-4"] <= 0.05
        assert 0.0 < drops["textclf-5"] <= 0.015

    def test_threshold_stop_triggered_for_34(self, textclf_dedup):
        assert textclf_dedup.stopped["textclf-3"]
        assert textclf_dedup.stopped["textclf-4"]
        assert not textclf_dedup.stopped["textclf-1"]
        assert not textclf_dedup.stopped["textclf-2"]

    def test_model1_blocks_are_representatives(self, textclf_dedup):
        # Model-1 is indexed first: every block it maps to is its own.
        f = textclf_dedup.mapping["textclf-1"]
        for ref, did in f.items():
            assert textclf_dedup.distinct[did].rep_model == "textclf-1"

    def test_sharing_matches_planted_classes(self, textclf_wl, textclf_dedup):
        owners = textclf_dedup.owners()
        by_count = {}
        for o in owners.values():
            by_count[len(o)] = by_count.get(len(o), 0) + 1
        # planted: 408 blocks shared by all 5 (A + merged E reps inflate ~416)
        assert 400 <= by_count.get(5, 0) <= 430
        assert by_count.get(4, 0) >= 40  # B class


class TestExactOnTextClf:
    def test_matches_paper_2040(self, textclf_wl):
        res = DI.dedup_mistique_exact(textclf_wl)
        assert res.n_distinct() == 2040  # exactly Table 9's exact-dedup row

    def test_no_accuracy_change(self, textclf_wl):
        res = DI.dedup_mistique_exact(textclf_wl)
        assert all(d == 0 for d in res.accuracy_drop().values())


@pytest.mark.slow
class TestBaselineMethods:
    def test_pairwise_compresses_similarly(self, textclf_wl):
        res = DI.dedup_pairwise(textclf_wl)
        assert 630 <= res.n_distinct() <= 720

    def test_minhash_compresses_least_of_similarity_methods(self, textclf_wl, textclf_dedup):
        res = DI.dedup_mistique_approx(textclf_wl)
        # Paper Table 9 ordering: minhash (712) > proposed (662)
        assert res.n_distinct() >= textclf_dedup.n_distinct()


class TestWord2Vec:
    def test_distinct_matches_planted(self, w2v_dedup):
        # 460 shared + 6 x 52 private = 772
        assert 765 <= w2v_dedup.n_distinct() <= 790
        assert w2v_dedup.n_logical_blocks == 3072

    def test_storage_reduction_3_6x(self, w2v_dedup, w2v_wl):
        before, after = w2v_dedup.logical_bytes(w2v_wl.logical_block_bytes)
        assert before == 24 * 2**30  # paper: >24 GB for 6 models
        assert 3.0 <= before / after <= 4.5  # paper: 3.6x

    def test_no_stops(self, w2v_dedup):
        assert not any(w2v_dedup.stopped.values())


class TestFFNN:
    def test_w1_fully_deduplicated(self, ffnn_dedup):
        # 598 shared W1 + 3 x 15 private W2 = 643 distinct
        assert ffnn_dedup.n_distinct() == 643
        assert ffnn_dedup.n_logical_blocks == 3 * (598 + 15)

    def test_storage_15_to_5_4_gb(self, ffnn_dedup, ffnn_wl):
        before, after = ffnn_dedup.logical_bytes(ffnn_wl.logical_block_bytes)
        assert before / 2**30 == pytest.approx(14.4, abs=0.5)  # paper: 15 GB
        assert after / 2**30 == pytest.approx(5.0, abs=0.4)  # paper: 5.4 GB

    def test_no_accuracy_impact(self, ffnn_dedup):
        assert all(d == 0 for d in ffnn_dedup.accuracy_drop().values())
