"""Benchmark fixtures: shared pre-built artifacts so each benchmark times
only its table's core computation, not workload generation."""
import pytest

from repro.experiments import tables as T


@pytest.fixture(scope="session")
def art():
    return T.artifacts()


@pytest.fixture(scope="session")
def textclf_tb(art):
    return art["textclf_dedup"].tensor_block_lists()


@pytest.fixture(scope="session")
def w2v_tb(art):
    return art["w2v_dedup"].tensor_block_lists()
