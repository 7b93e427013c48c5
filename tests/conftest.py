"""Shared session-scoped fixtures: workloads and dedup results are expensive
to build (seconds), so every test module reuses one instance."""
import pytest

from repro.core import dedup_index as DI
from repro.models import zoo


@pytest.fixture(scope="session")
def textclf_wl():
    return zoo.make_text_classification_workload()


@pytest.fixture(scope="session")
def w2v_wl():
    return zoo.make_word2vec_workload()


@pytest.fixture(scope="session")
def ffnn_wl():
    return zoo.make_ffnn_workload()


@pytest.fixture(scope="session")
def textclf_dedup(textclf_wl):
    return DI.dedup_proposed(textclf_wl)


@pytest.fixture(scope="session")
def w2v_dedup(w2v_wl):
    return DI.dedup_proposed(w2v_wl)


@pytest.fixture(scope="session")
def ffnn_dedup(ffnn_wl):
    return DI.dedup_proposed(ffnn_wl)


@pytest.fixture(scope="session")
def textclf_packed(textclf_wl, textclf_dedup):
    from repro.paging import packing as P

    tb = textclf_dedup.tensor_block_lists()
    packed = P.pack_two_stage(tb, textclf_wl.blocks_per_page)
    return tb, packed
