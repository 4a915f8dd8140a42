"""Fig. 7 reproduction (as a table): end-to-end runtime per kernel and
dataset for STOREL, Taco-sim, SciPy-like, NumPy, Torch/TF-sim and DuckDB.

Matrix kernels (MMM, ΣMMM, BATAX) run over the six Table-2 matrix analogs;
rank-3 kernels (TTM, MTTKRP) over the four tensor analogs with the
Python-framework columns absent (they lack sparse rank-3, Sec. 6.1).
Expected shape (paper Sec. 6.1): STOREL ≈ Taco on MMM/TTM, STOREL ≫ Taco
on ΣMMM/BATAX/MTTKRP (factorization); NumPy OOMs on the large analogs;
DuckDB competitive on TTM but slow on the factorizable kernels.
"""
from __future__ import annotations

from repro.experiments.runners import (
    baseline_runner, median_time, prepare_storel, prepare_taco, print_table,
)
from repro.experiments.table3 import DENSITY, FIXED_SYSTEMS
from repro.storage.coo import random_sparse
from repro.synth_tensors import (
    DEFAULT_SCALE, TABLE2_MATRICES, TABLE2_TENSORS, analog, sf_vector,
)

STOREL_FMTS = {
    "MMM": {"A": "csr", "B": "csr"},
    "SumMMM": {"A": "csc", "B": "csr"},
    # paper: CSR. In our Python engine the measured best (Table-3 sweep)
    # is the hash/trie format — dict iteration is C-speed while a dense
    # row level pays ~2us per (possibly empty) row.
    "BATAX": {"A": "hash", "x": "dense"},
    "TTM": {"A": "csf", "B": "csc"},
    # the paper's best is (csf, csr, csc); in our Python engine the
    # measured best (Table-3 sweep) is csr for D as well — our cost of a
    # CSC column scan differs from their merge-based iteration
    "MTTKRP": {"B": "csf", "C": "csr", "D": "csr"},
}
# Taco fails to compile TTM with CSC (Sec. 6.1), so its column uses CSR;
# for BATAX the Taco simulation's own measured best is the hash format
# (the Table-3 sweep), which is what its column reports.
TACO_FMTS = {**STOREL_FMTS, "TTM": {"A": "csf", "B": "csr"},
             "BATAX": {"A": "hash", "x": "dense"},
             "MTTKRP": {"B": "csf", "C": "csr", "D": "csr"}}

MATRIX_KERNELS = ("MMM", "SumMMM", "BATAX")
TENSOR_KERNELS = ("TTM", "MTTKRP")


def _data_for(kname: str, dataset: str, scale: float):
    main = analog(dataset, scale)
    if kname in ("MMM", "SumMMM"):
        n = main.shape[1]
        return (
            {"A": main, "B": random_sparse((n, 250), DENSITY, seed=7)},
            {},
        )
    if kname == "BATAX":
        return {"A": main, "x": sf_vector(main.shape[1], seed=7)}, {"beta": 2.0}
    if kname == "TTM":
        return (
            {"A": main, "B": random_sparse((25, main.shape[2]), DENSITY, seed=7)},
            {},
        )
    return (
        {
            "B": main,
            "C": random_sparse((main.shape[1], 25), DENSITY, seed=7),
            "D": random_sparse((main.shape[2], 25), DENSITY, seed=8),
        },
        {},
    )


def _cell(system, kname, coos, scalars, repeat):
    try:
        if system == "storel":
            p = prepare_storel(kname, coos, STOREL_FMTS[kname],
                               scalars or None)
            return round(median_time(p.runner, repeat) * 1e3, 2)
        if system == "taco":
            p = prepare_taco(kname, coos, TACO_FMTS[kname], scalars or None)
            return round(median_time(p.runner, repeat) * 1e3, 2)
        r = baseline_runner(system, kname, coos, scalars)
        if r is None:
            return "n/a"
        return round(median_time(r, repeat) * 1e3, 2)
    except MemoryError:
        return "OOM"


def rows(scale: float = DEFAULT_SCALE, repeat: int = 3,
         datasets=None, kernels=None) -> list[dict]:
    out = []
    systems = ["storel", "taco", *FIXED_SYSTEMS.keys()]
    for kname in kernels or (*MATRIX_KERNELS, *TENSOR_KERNELS):
        table = (
            TABLE2_MATRICES if kname in MATRIX_KERNELS else TABLE2_TENSORS
        )
        for ds in datasets or table:
            if ds not in table:
                continue
            coos, scalars = _data_for(kname, ds, scale)
            row = {"kernel": kname, "dataset": ds}
            for system in systems:
                row[f"{system}_ms"] = _cell(
                    system, kname, coos, scalars, repeat
                )
            out.append(row)
    return out


def main(scale: float = DEFAULT_SCALE) -> list[dict]:
    r = rows(scale)
    print_table("Fig. 7: end-to-end runtime (ms)", r)
    return r


if __name__ == "__main__":
    main()
