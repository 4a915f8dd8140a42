"""Every Tensor Storage Mapping, evaluated by the reference interpreter
over its physical arrays, must reproduce the logical tensor exactly.
This is the Sec.-4 correctness contract: TSM(physical data) == tensor."""
import numpy as np
import pytest

from repro.sdqlite.interp import canon, interp
from repro.sdqlite.parser import parse
from repro.storage.coo import COO, from_dense, random_sparse, to_nested
from repro.storage.formats import (
    MATRIX_FORMATS, TENSOR3_FORMATS, VECTOR_FORMATS, store,
)


def _check_tsm(st):
    got = canon(interp(parse(st.tsm_src), dict(st.env)))
    want = canon(to_nested(st.coo))
    assert got == want, f"format {st.fmt} storage mapping is wrong"


MAT_CASES = [
    ("tiny", random_sparse((5, 7), 0.3, seed=1)),
    ("row-gaps", random_sparse((10, 6), 0.1, seed=2)),
    ("dense-ish", random_sparse((6, 6), 0.9, seed=3)),
    ("single", COO((3, 3), np.array([[1, 2]]), np.array([4.0]))),
]


@pytest.mark.parametrize("fmt", ["dense", "coo", "csr", "csc", "dcsr", "hash"])
@pytest.mark.parametrize("case,coo", MAT_CASES)
def test_matrix_tsm_roundtrip(fmt, case, coo):
    _check_tsm(store("A", coo, fmt))


def test_paper_fig1_csr_example():
    # The matrix of Fig. 1(b): rows (6,0,9,8), (0,0,0,0), (5,0,0,7).
    dense = np.array([
        [6.0, 0, 9, 8],
        [0, 0, 0, 0],
        [5.0, 0, 0, 7],
    ])
    st = store("C", from_dense(dense), "csr")
    assert st.env["C_len1"] == 3
    assert st.env["C_pos2"].tolist() == [0, 3, 3, 5]
    assert st.env["C_idx2"].tolist() == [0, 2, 3, 0, 3]
    assert st.env["C_val"].tolist() == [6, 9, 8, 5, 7]
    _check_tsm(st)


def test_paper_dcsr_example():
    # Sec. 2's sparse-sparse representation of the same matrix.
    dense = np.array([
        [6.0, 0, 9, 8],
        [0, 0, 0, 0],
        [5.0, 0, 0, 7],
    ])
    st = store("C", from_dense(dense), "dcsr")
    assert st.env["C_pos1"].tolist() == [0, 2]
    assert st.env["C_idx1"].tolist() == [0, 2]
    assert st.env["C_pos2"].tolist() == [0, 3, 5]
    assert st.env["C_idx2"].tolist() == [0, 2, 3, 0, 3]
    _check_tsm(st)


@pytest.mark.parametrize("fmt", sorted(TENSOR3_FORMATS))
def test_tensor3_tsm_roundtrip(fmt):
    coo = random_sparse((4, 5, 6), 0.15, seed=4)
    _check_tsm(store("B", coo, fmt))


@pytest.mark.parametrize("fmt", sorted(VECTOR_FORMATS))
def test_vector_tsm_roundtrip(fmt):
    coo = random_sparse((12,), 0.4, seed=5)
    _check_tsm(store("x", coo, fmt))


def test_lower_triangular_tsm():
    n = 5
    rng = np.random.default_rng(6)
    dense = np.tril(rng.random((n, n)) + 0.1)
    _check_tsm(store("A", from_dense(dense), "lowertri"))


def test_band_tsm():
    n = 6
    rng = np.random.default_rng(7)
    dense = np.zeros((n, n))
    for p in range(n):
        dense[p, p] = rng.random() + 0.1
        if p + 1 < n:
            dense[p, p + 1] = rng.random() + 0.1
            dense[p + 1, p] = rng.random() + 0.1
    _check_tsm(store("B", from_dense(dense), "band"))


def test_zorder_tsm():
    n = 8
    rng = np.random.default_rng(8)
    dense = (rng.random((n, n)) > 0.5) * (rng.random((n, n)) + 0.1)
    _check_tsm(store("C", from_dense(dense), "zorder"))


def test_coo_container_sorted_and_dense_roundtrip():
    coo = random_sparse((9, 9), 0.3, seed=9)
    back = from_dense(coo.to_dense())
    assert np.array_equal(back.coords, coo.coords)
    assert np.allclose(back.vals, coo.vals)
    # lexicographic sort
    keys = coo.coords[:, 0] * 9 + coo.coords[:, 1]
    assert np.all(np.diff(keys) > 0)


def test_csr_segment_stats_present():
    st = store("A", random_sparse((10, 10), 0.2, seed=10), "csr")
    assert "A_idx2#segment" in st.var_est


def test_transpose():
    coo = random_sparse((4, 6), 0.4, seed=11)
    assert np.allclose(coo.transpose().to_dense(), coo.to_dense().T)


def test_density():
    coo = random_sparse((10, 10), 0.25, seed=12)
    assert abs(coo.density() - 0.25) < 0.05
