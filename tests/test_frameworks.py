"""Framework (TensorFlow-stand-in) cost model: Tables 3/8 failure patterns."""
import pytest

from repro.serving import frameworks as FW

GB = 2**30

W2V = dict(model_bytes=4 * GB, input_bytes=800 * 2**20, flops_per_model=1e11)
W2V_EMB = dict(model_bytes=2 * GB, input_bytes=8 * 2**20, n_ids=1_000_000)
FFNN = dict(model_bytes=int(4.9 * GB), input_bytes=int(4.78 * GB), flops_per_model=1.2e12)


def test_cpu_matmul_3_models_runs():
    r = FW.serve_matmul(FW.TF_CPU, n_models=3, source="mem", **W2V)
    assert not r.failed
    assert 5 <= r.latency_seconds <= 15  # paper: 9


@pytest.mark.parametrize("n", [6, 12])
@pytest.mark.parametrize("src", ["mem", "file", "db"])
def test_cpu_matmul_fails_beyond_3(n, src):
    assert FW.serve_matmul(FW.TF_CPU, n_models=n, source=src, **W2V).failed


@pytest.mark.parametrize("n", [6, 12])
def test_gpu_matmul_fails_beyond_3(n):
    assert FW.serve_matmul(FW.TF_GPU, n_models=n, source="mem", **W2V).failed


def test_gpu_matmul_3_models_runs_all_sources():
    for src in ("mem", "file", "db"):
        assert not FW.serve_matmul(FW.TF_GPU, n_models=3, source=src, **W2V).failed


def test_embedding_gpu_fails_at_3():
    """Paper Table 3: Keras embedding on GPU fails even at 3 models."""
    assert FW.serve_embedding_lookup(FW.TF_GPU, n_models=3, source="mem", **W2V_EMB).failed


def test_embedding_cpu_3_runs_6_fails():
    ok = FW.serve_embedding_lookup(FW.TF_CPU, n_models=3, source="mem", **W2V_EMB)
    assert not ok.failed and 50 <= ok.latency_seconds <= 65  # paper: 57
    assert FW.serve_embedding_lookup(FW.TF_CPU, n_models=6, source="mem", **W2V_EMB).failed


def test_ffnn_file_fails_at_3_but_db_runs():
    """Paper Table 8: TF-file fails at 3 models (parse buffers), TF-DB runs."""
    assert FW.serve_matmul(FW.TF_CPU_DENSE, n_models=3, source="file", n_blobs=1000, **FFNN).failed
    assert not FW.serve_matmul(FW.TF_CPU_DENSE, n_models=3, source="db", n_blobs=1000, **FFNN).failed


def test_ffnn_gpu_2_runs_3_fails():
    assert not FW.serve_matmul(FW.TF_GPU, n_models=2, source="mem", **FFNN).failed
    assert FW.serve_matmul(FW.TF_GPU, n_models=3, source="mem", **FFNN).failed


def test_source_ordering_w2v():
    """mem < file < db for the 400-BLOB word2vec input (paper row 1)."""
    lats = [
        FW.serve_matmul(FW.TF_CPU, n_models=3, source=s, n_blobs=b, **W2V).latency_seconds
        for s, b in (("mem", 0), ("file", 0), ("db", 40_000))
    ]
    assert lats[0] < lats[1] < lats[2]


def test_source_ordering_ffnn():
    """mem < db < file for the 1-BLOB-per-row FFNN input (paper Table 8)."""
    lats = [
        FW.serve_matmul(FW.TF_CPU_DENSE, n_models=2, source=s, n_blobs=b, **FFNN).latency_seconds
        for s, b in (("mem", 0), ("db", 1000), ("file", 0))
    ]
    assert lats[0] < lats[1] < lats[2]


def test_latency_monotone_in_models():
    l2 = FW.serve_matmul(FW.TF_CPU_DENSE, n_models=2, source="mem", **FFNN).latency_seconds
    l3 = FW.serve_matmul(FW.TF_CPU_DENSE, n_models=3, source="mem", **FFNN).latency_seconds
    assert l3 > l2


def test_unknown_source_raises():
    with pytest.raises(ValueError):
        FW.serve_matmul(FW.TF_CPU, n_models=1, source="s3", **W2V)


def test_result_cell_format():
    ok = FW.serve_matmul(FW.TF_CPU, n_models=1, source="mem", **W2V)
    assert ok.cell().isdigit()
    bad = FW.serve_matmul(FW.TF_CPU, n_models=12, source="mem", **W2V)
    assert bad.cell() == "Failed"
