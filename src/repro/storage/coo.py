"""Canonical coordinate (COO) container for sparse tensors of any rank.

Every storage format is built from a :class:`COO`; every baseline and the
Spark engine consume the same COO, so all systems compute over identical
data.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class COO:
    """shape: tensor dimensions; coords: (nnz, d) int array sorted
    lexicographically; vals: (nnz,) float array. Coordinates are unique."""

    shape: tuple[int, ...]
    coords: np.ndarray
    vals: np.ndarray

    def __post_init__(self):
        self.coords = np.asarray(self.coords, dtype=np.int64).reshape(
            -1, len(self.shape)
        )
        self.vals = np.asarray(self.vals, dtype=np.float64).reshape(-1)
        order = np.lexsort(self.coords.T[::-1])
        self.coords = self.coords[order]
        self.vals = self.vals[order]

    @property
    def nnz(self) -> int:
        return len(self.vals)

    @property
    def rank(self) -> int:
        return len(self.shape)

    def to_dense(self) -> np.ndarray:
        out = np.zeros(self.shape)
        out[tuple(self.coords.T)] = self.vals
        return out

    def transpose(self) -> "COO":
        """Swap the two dims of a matrix."""
        assert self.rank == 2
        return COO(
            (self.shape[1], self.shape[0]), self.coords[:, ::-1], self.vals
        )

    def density(self) -> float:
        return self.nnz / max(1, int(np.prod(self.shape)))


def from_dense(a: np.ndarray) -> COO:
    coords = np.argwhere(a != 0)
    return COO(a.shape, coords, a[tuple(coords.T)])


def random_sparse(
    shape: tuple[int, ...], density: float, seed: int = 0
) -> COO:
    """Uniform random sparse tensor with ~density * prod(shape) non-zeros.
    Values are in (0.1, 1.1) so none are accidentally zero."""
    rng = np.random.default_rng(seed)
    total = int(np.prod(shape))
    nnz = max(1, min(total, int(round(density * total))))
    flat = rng.choice(total, size=nnz, replace=False)
    coords = np.stack(np.unravel_index(flat, shape), axis=1)
    vals = rng.random(nnz) + 0.1
    return COO(shape, coords, vals)


def to_nested(coo: COO):
    """The logical nested-dictionary value of the tensor (for the
    reference interpreter and oracle tests)."""
    root: dict = {}
    for c, v in zip(coo.coords.tolist(), coo.vals.tolist()):
        d = root
        for i in c[:-1]:
            d = d.setdefault(int(i), {})
        d[int(c[-1])] = float(v)
    return root
