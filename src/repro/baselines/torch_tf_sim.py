"""PyTorch / TensorFlow simulation (neither is installed; DESIGN.md Sec 2).

Paper footnote 3: "PyTorch and TensorFlow only support a sparse-dense
matrix multiplication." That is the single primitive exposed here
(:func:`sp_dense_mm`, built on the scipy_like CSR). Every kernel is
composed from it, materializing **dense** intermediates — reproducing why
these frameworks are orders of magnitude slower when the paper's
high-level optimizations would have applied, yet competitive when a
hand-optimized primitive composition exists (their BATAX entry).
"""
from __future__ import annotations

import numpy as np

from repro.baselines.numpy_dense import check_memory
from repro.baselines.scipy_like import CSR
from repro.storage.coo import COO


def sp_dense_mm(A: COO, B_dense: np.ndarray) -> np.ndarray:
    """The one supported primitive: sparse matrix times dense matrix."""
    return CSR.from_coo(A).dense_mm(B_dense)


def mmm(A: COO, B: COO) -> np.ndarray:
    check_memory(B)  # B must be densified first
    return sp_dense_mm(A, B.to_dense())


def sum_mmm(A: COO, B: COO) -> float:
    check_memory(B)
    return float(sp_dense_mm(A, B.to_dense()).sum())  # dense intermediate


def batax(beta: float, A: COO, x: np.ndarray) -> np.ndarray:
    """The paper's hand-optimized plan: two sparse-dense products."""
    t = sp_dense_mm(A, x.reshape(-1, 1))
    a_t = CSR.from_coo(A.transpose())
    return beta * a_t.dense_mm(t).reshape(-1)
