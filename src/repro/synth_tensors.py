"""Synthetic analogs of the paper's evaluation datasets (Table 2).

The paper uses six SuiteSparse matrices and four FROSTT rank-3 tensors;
neither collection is downloadable in this offline container, so each
dataset is replaced by a uniform random sparse tensor with the SAME
density and aspect ratio, dimensions scaled by ``scale`` (default 1/20) so
that single-core Python execution finishes in seconds (DESIGN.md Sec. 2).
The kernels' relative plan costs depend on (dims, density, nnz/row), which
the analogs preserve.

Also provides SF-parameterized generators in the spirit of
``repro.synth_data`` (SF=0.01 for tests, SF=0.1 for benchmarks).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.storage.coo import COO, random_sparse

# name -> (paper shape, paper density, paper nnz) — Table 2 verbatim
TABLE2_MATRICES = {
    "cant": ((62_000, 62_000), 1e-3, 2_030_000),
    "consph": ((83_000, 83_000), 9e-4, 3_050_000),
    "cop20k_A": ((121_000, 121_000), 2e-4, 1_360_000),
    "pdb1HYS": ((36_000, 36_000), 3e-3, 2_190_000),
    "rma10": ((46_000, 46_000), 1e-3, 2_370_000),
    "webbase": ((1_000_000, 1_000_000), 3e-6, 3_110_000),
}

TABLE2_TENSORS = {
    "NIPS": ((2_400, 2_800, 14_000), 3e-5, 31_310_000),
    "NELL": ((12_000, 9_200, 29_000), 2e-5, 76_880_000),
    "Facebook": ((1_600, 64_000, 64_000), 1e-7, 740_000),
    "Enron": ((6_000, 5_700, 244_000), 3e-6, 3_100_000),
}

TABLE2 = {**TABLE2_MATRICES, **TABLE2_TENSORS}

DEFAULT_SCALE = 1 / 20


@dataclass
class DatasetRow:
    """One row of our reproduced Table 2."""

    name: str
    shape: tuple[int, ...]
    density: float
    nnz: int
    paper_shape: tuple[int, ...]
    paper_density: float
    paper_nnz: int


def analog(name: str, scale: float = DEFAULT_SCALE, seed: int = 0) -> COO:
    """The scaled synthetic analog of Table-2 dataset ``name``.

    webbase is a web graph: its row degrees are heavy-tailed, which is
    exactly what makes BATAX's factorization matter there (the paper's
    16.4x); a uniform analog would erase that, so webbase rows are drawn
    from a Zipf distribution instead.
    """
    shape, density, _nnz = TABLE2[name]
    small = tuple(max(8, int(round(d * scale))) for d in shape)
    seed = seed + sum(map(ord, name))
    if name == "webbase":
        return _zipf_rows_matrix(small, density, seed=seed)
    return random_sparse(small, density, seed=seed)


def _zipf_rows_matrix(
    shape: tuple[int, int], density: float, alpha: float = 1.1, seed: int = 0
) -> COO:
    """Sparse matrix whose row degrees follow a Zipf law (web-graph-like);
    total nnz matches ``density * m * n``."""
    m, n = shape
    rng = np.random.default_rng(seed)
    nnz = max(1, int(round(density * m * n)))
    ranks = np.arange(1, m + 1)
    w = 1.0 / ranks ** alpha
    w /= w.sum()
    rows = rng.choice(m, size=nnz, p=w)
    cols = rng.integers(0, n, size=nnz)
    keys = np.unique(rows.astype(np.int64) * n + cols)
    coords = np.stack([keys // n, keys % n], axis=1)
    vals = rng.random(len(keys)) + 0.1
    return COO(shape, coords, vals)


def dataset_row(name: str, scale: float = DEFAULT_SCALE) -> DatasetRow:
    coo = analog(name, scale)
    shape, density, nnz = TABLE2[name]
    return DatasetRow(
        name=name,
        shape=coo.shape,
        density=coo.density(),
        nnz=coo.nnz,
        paper_shape=shape,
        paper_density=density,
        paper_nnz=nnz,
    )


# ---------------------------------------------------------------------------
# SF-parameterized random matrices/vectors (Sec. 6.2 synthetic data)
# ---------------------------------------------------------------------------

def sf_matrix(
    sf: float, density: float = 2 ** -5, seed: int = 0, aspect: float = 1.0
) -> COO:
    """A random sparse matrix whose nnz scales linearly with SF
    (SF=1.0 -> ~1M non-zeros at the default density)."""
    n = max(8, int(round((1_000_000 * sf / density) ** 0.5 / aspect ** 0.5)))
    m = max(8, int(round(n * aspect)))
    return random_sparse((m, n), density, seed=seed)


def sf_vector(n: int, seed: int = 0) -> COO:
    """A fully dense vector of length n (BATAX keeps x dense, Sec. 6.2)."""
    return random_sparse((n,), 1.0, seed=seed)


def sweep_densities(lo_exp: int = -10, hi_exp: int = -1) -> list[float]:
    """The 2^lo .. 2^hi density grid of the Fig. 8 sparsity sweep."""
    return [2.0 ** e for e in range(lo_exp, hi_exp + 1)]
