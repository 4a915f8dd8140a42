"""Baseline systems: every comparator must produce the same numbers as the
dense NumPy closed forms (and thereby the oracle)."""
import numpy as np
import pytest

from repro.baselines import duckdb_rel, numpy_dense, scipy_like, torch_tf_sim
from repro.baselines.scipy_like import CSR
from repro.baselines.taco_sim import TACO_EXCLUDE, compile_taco
from repro.core import reference as ref
from repro.core.compile import Limits
from repro.core.kernels import KERNELS
from repro.exec.codegen import run_plan
from repro.sdqlite.interp import canon
from repro.storage.coo import random_sparse
from repro.storage.formats import store


@pytest.fixture(scope="module")
def mats():
    A = random_sparse((20, 16), 0.25, seed=1)
    B = random_sparse((16, 18), 0.25, seed=2)
    x = random_sparse((16,), 1.0, seed=3).to_dense()
    return A, B, x


def test_csr_roundtrip(mats):
    A, _, _ = mats
    assert np.allclose(CSR.from_coo(A).to_dense(), A.to_dense())


def test_csr_transpose(mats):
    A, _, _ = mats
    assert np.allclose(CSR.from_coo(A).transpose().to_dense(),
                       A.to_dense().T)


def test_scipy_like_spmv(mats):
    A, _, x = mats
    got = CSR.from_coo(A).spmv(x)
    assert np.allclose(got, A.to_dense() @ x)


def test_scipy_like_spgemm(mats):
    A, B, _ = mats
    got = scipy_like.mmm(A, B).to_dense()
    assert np.allclose(got, ref.mmm(A.to_dense(), B.to_dense()))


def test_scipy_like_sum_mmm_and_batax(mats):
    A, B, x = mats
    assert scipy_like.sum_mmm(A, B) == pytest.approx(
        ref.sum_mmm(A.to_dense(), B.to_dense())
    )
    assert np.allclose(
        scipy_like.batax(2.0, A, x), ref.batax(2.0, A.to_dense(), x)
    )


def test_numpy_dense_kernels(mats):
    A, B, x = mats
    assert np.allclose(numpy_dense.mmm(A, B),
                       ref.mmm(A.to_dense(), B.to_dense()))
    assert np.allclose(numpy_dense.batax(1.5, A, x),
                       ref.batax(1.5, A.to_dense(), x))


def test_numpy_dense_oom_guard():
    big = random_sparse((4000, 4000), 1e-5, seed=4)
    with pytest.raises(MemoryError):
        numpy_dense.check_memory(big, budget=1024 * 1024)


def test_torch_tf_sim_kernels(mats):
    A, B, x = mats
    assert np.allclose(torch_tf_sim.mmm(A, B),
                       ref.mmm(A.to_dense(), B.to_dense()))
    assert torch_tf_sim.sum_mmm(A, B) == pytest.approx(
        ref.sum_mmm(A.to_dense(), B.to_dense())
    )
    assert np.allclose(torch_tf_sim.batax(2.0, A, x),
                       ref.batax(2.0, A.to_dense(), x))


def test_duckdb_baseline_matches_reference(mats):
    A, B, x = mats
    from repro.storage.coo import COO
    got = duckdb_rel.run_duckdb(KERNELS["MMM"], {"A": A, "B": B})
    dense = np.zeros((20, 18))
    dense[got["i"].to_numpy(), got["k"].to_numpy()] = got["v"].to_numpy()
    assert np.allclose(dense, ref.mmm(A.to_dense(), B.to_dense()))


def test_duckdb_batax_with_scalar_relation(mats):
    A, _, x = mats
    xcoo = random_sparse((16,), 1.0, seed=3)
    got = duckdb_rel.run_duckdb(
        KERNELS["BATAX"], {"A": A, "x": xcoo}, {"beta": 2.0}
    )
    dense = np.zeros(16)
    dense[got["j"].to_numpy()] = got["v"].to_numpy()
    assert np.allclose(dense, ref.batax(2.0, A.to_dense(), x))


def test_taco_sim_correct_but_unfactorized(mats):
    A, _, x = mats
    stored = {
        "A": store("A", A, "csr"),
        "x": store("x", random_sparse((16,), 1.0, seed=3), "dense"),
    }
    lim = Limits(max_iters=8, max_nodes=8000, timeout_s=8)
    taco = compile_taco(
        KERNELS["BATAX"], stored, scalar_env={"beta": 2.0}, limits=lim
    )
    got = canon(run_plan(taco.plan, taco.env, taco.gdepth))
    assert np.allclose(
        ref.nested_to_dense(got, (16,)), ref.batax(2.0, A.to_dense(), x)
    )
    assert {"D1", "D2", "D3"} <= {r.rstrip("r") for r in TACO_EXCLUDE}


def test_table2_analogs_have_paper_densities():
    from repro.synth_tensors import TABLE2, analog, dataset_row
    for name in ("cant", "webbase", "NIPS", "Facebook"):
        row = dataset_row(name)
        _shape, density, _ = TABLE2[name]
        # density preserved within 2x (integer rounding at small scale)
        assert 0.5 * density <= row.density <= 2.0 * density or row.nnz <= 16
        assert len(row.shape) == len(row.paper_shape)


def test_sf_matrix_scales_with_sf():
    from repro.synth_tensors import sf_matrix
    small = sf_matrix(0.001, seed=1)
    big = sf_matrix(0.01, seed=1)
    assert 5 * small.nnz <= big.nnz <= 20 * small.nnz
