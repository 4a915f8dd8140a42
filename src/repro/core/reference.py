"""Dense NumPy closed forms of the five kernels — independent ground truth
used by tests alongside the DuckDB oracle."""
from __future__ import annotations

import numpy as np


def mmm(A: np.ndarray, B: np.ndarray) -> np.ndarray:
    """Q(i,k) = sum_j A(i,j) B(j,k)."""
    return A @ B


def sum_mmm(A: np.ndarray, B: np.ndarray) -> float:
    """Q() = sum_{i,j,k} A(i,j) B(j,k)."""
    return float((A @ B).sum())


def batax(beta: float, A: np.ndarray, x: np.ndarray) -> np.ndarray:
    """Q(j) = beta * sum_{i,k} A(i,j) A(i,k) x(k)."""
    return beta * (A.T @ (A @ x))


def ttm(A: np.ndarray, B: np.ndarray) -> np.ndarray:
    """Q(i,j,k) = sum_l A(i,j,l) B(k,l)."""
    return np.einsum("ijl,kl->ijk", A, B)


def mttkrp(B: np.ndarray, C: np.ndarray, D: np.ndarray) -> np.ndarray:
    """Q(i,j) = sum_{k,l} B(i,k,l) C(k,j) D(l,j)."""
    return np.einsum("ikl,kj,lj->ij", B, C, D)


def nested_to_dense(value, shape: tuple[int, ...]) -> np.ndarray:
    """Convert a (canonical) nested-dict kernel result to a dense array."""
    out = np.zeros(shape)
    if not isinstance(value, dict):
        if shape == ():
            return np.asarray(float(value))
        return out

    def fill(d, idx):
        for k, v in d.items():
            if isinstance(v, dict):
                fill(v, idx + (k,))
            else:
                out[idx + (k,)] = v

    fill(value, ())
    return out
