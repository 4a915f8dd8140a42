"""SciPy-architecture baseline: fixed, vectorized CSR primitives.

SciPy itself is not installed in this container; these NumPy-vectorized
CSR routines stand in for its compiled kernels (DESIGN.md Sec. 2). The
crucial architectural property is preserved: only *whole-operation*
primitives exist (spmv, spgemm, sparse-dense), so compound kernels must
compose them and **materialize every intermediate**, which is what the
paper shows becoming the bottleneck (Sec. 6.1).
"""
from __future__ import annotations

import numpy as np

from repro.storage.coo import COO


class CSR:
    """Minimal CSR matrix with vectorized primitives."""

    def __init__(self, pos, idx, val, shape):
        self.pos, self.idx, self.val = pos, idx, val
        self.shape = shape

    @classmethod
    def from_coo(cls, coo: COO) -> "CSR":
        m, n = coo.shape
        counts = np.bincount(coo.coords[:, 0], minlength=m)
        pos = np.zeros(m + 1, dtype=np.int64)
        np.cumsum(counts, out=pos[1:])
        return cls(pos, coo.coords[:, 1].copy(), coo.vals.copy(), (m, n))

    def transpose(self) -> "CSR":
        m, n = self.shape
        rows = np.repeat(np.arange(m), np.diff(self.pos))
        order = np.lexsort((rows, self.idx))
        t = COO((n, m), np.stack([self.idx[order], rows[order]], axis=1),
                self.val[order])
        return CSR.from_coo(t)

    # -- primitives -------------------------------------------------------
    def spmv(self, x: np.ndarray) -> np.ndarray:
        """Sparse matrix times dense vector."""
        rows = np.repeat(np.arange(self.shape[0]), np.diff(self.pos))
        out = np.zeros(self.shape[0])
        np.add.at(out, rows, self.val * x[self.idx])
        return out

    def dense_mm(self, B: np.ndarray) -> np.ndarray:
        """Sparse times dense matrix (materializes a dense result)."""
        out = np.zeros((self.shape[0], B.shape[1]))
        rows = np.repeat(np.arange(self.shape[0]), np.diff(self.pos))
        np.add.at(out, rows, self.val[:, None] * B[self.idx])
        return out

    def spgemm(self, other: "CSR") -> "CSR":
        """Sparse-sparse matrix multiply (row-wise accumulation)."""
        m, _ = self.shape
        p = other.shape[1]
        out_pos = [0]
        out_idx, out_val = [], []
        for i in range(m):
            acc = np.zeros(p)
            s, e = self.pos[i], self.pos[i + 1]
            for t in range(s, e):
                j = self.idx[t]
                bs, be = other.pos[j], other.pos[j + 1]
                acc[other.idx[bs:be]] += self.val[t] * other.val[bs:be]
            nz = np.nonzero(acc)[0]
            out_idx.append(nz)
            out_val.append(acc[nz])
            out_pos.append(out_pos[-1] + len(nz))
        return CSR(
            np.asarray(out_pos, dtype=np.int64),
            np.concatenate(out_idx) if out_idx else np.array([], np.int64),
            np.concatenate(out_val) if out_val else np.array([]),
            (m, p),
        )

    def sum(self) -> float:
        return float(self.val.sum())

    def to_dense(self) -> np.ndarray:
        out = np.zeros(self.shape)
        rows = np.repeat(np.arange(self.shape[0]), np.diff(self.pos))
        out[rows, self.idx] = self.val
        return out


# -- kernel compositions (each materializes its intermediates) --------------

def mmm(A: COO, B: COO) -> CSR:
    return CSR.from_coo(A).spgemm(CSR.from_coo(B))


def sum_mmm(A: COO, B: COO) -> float:
    return mmm(A, B).sum()  # materializes A@B, then reduces


def batax(beta: float, A: COO, x: np.ndarray) -> np.ndarray:
    a = CSR.from_coo(A)
    t = a.spmv(x)  # materialized intermediate
    return beta * a.transpose().spmv(t)
