"""NumPy baseline: dense-only storage (paper Sec. 6.1).

NumPy is real here; what we reproduce from the paper is its failure mode:
"NumPy requires all inputs to be dense, and runs out of memory for all but
four experiments". The container has more headroom than the paper's 32 GB
box relative to our scaled-down data, so :func:`check_memory` enforces the
same proportional budget — densifying a matrix whose dense form exceeds
the budget raises ``MemoryError`` exactly like the paper's runs did.
"""
from __future__ import annotations

import numpy as np

from repro.core import reference as ref
from repro.storage.coo import COO

# Dense bytes budget for a single operand (see module docstring).
DENSE_BUDGET_BYTES = 64 * 1024 * 1024


def check_memory(*coos: COO, budget: int = DENSE_BUDGET_BYTES) -> None:
    for c in coos:
        need = int(np.prod(c.shape)) * 8
        if need > budget:
            raise MemoryError(
                f"dense form needs {need >> 20} MiB > budget "
                f"{budget >> 20} MiB (paper: NumPy OOM)"
            )


def mmm(A: COO, B: COO) -> np.ndarray:
    check_memory(A, B)
    return ref.mmm(A.to_dense(), B.to_dense())


def sum_mmm(A: COO, B: COO) -> float:
    check_memory(A, B)
    return ref.sum_mmm(A.to_dense(), B.to_dense())


def batax(beta: float, A: COO, x: np.ndarray) -> np.ndarray:
    check_memory(A)
    return ref.batax(beta, A.to_dense(), x)
