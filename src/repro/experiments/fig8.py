"""Fig. 8 reproduction (as a table): runtime vs sparsity for sparse and
dense storage formats (Sec. 6.2).

For MMM / ΣMMM / BATAX we sweep the density 2^-10 .. 2^-1 and time
STOREL and Taco-sim under both the sparse format of Sec. 6.1 and the
fully dense format, plus SciPy-like and NumPy. Expected shape: sparse
wins at low density, dense takes over at high density, and for ΣMMM and
BATAX STOREL beats every other system at all densities (factorization).
"""
from __future__ import annotations

from repro.experiments.runners import (
    baseline_runner, median_time, prepare_storel, prepare_taco, print_table,
)
from repro.storage.coo import random_sparse
from repro.synth_tensors import sf_vector, sweep_densities

SPARSE_FMTS = {
    "MMM": {"A": "csr", "B": "csr"},
    "SumMMM": {"A": "csc", "B": "csr"},
    "BATAX": {"A": "csr", "x": "dense"},
}


def _data(kname: str, n: int, density: float, seed=0):
    if kname == "BATAX":
        return ({"A": random_sparse((n, n), density, seed=seed),
                 "x": sf_vector(n, seed=seed + 1)}, {"beta": 2.0})
    return ({"A": random_sparse((n, n), density, seed=seed),
             "B": random_sparse((n, n), density, seed=seed + 1)}, {})


def _dense_fmts(kname):
    return {t: "dense" for t in SPARSE_FMTS[kname]}


def rows(n: int = 160, densities=None, repeat: int = 2) -> list[dict]:
    out = []
    for kname in ("MMM", "SumMMM", "BATAX"):
        for d in densities or sweep_densities(-10, -2):
            coos, scalars = _data(kname, n, d)
            row = {"kernel": kname, "density": f"2^{d.bit_length() - 1}"
                   if d >= 1 else f"{d:.1e}"}
            for label, prep, fmts in (
                ("storel_sparse", prepare_storel, SPARSE_FMTS[kname]),
                ("storel_dense", prepare_storel, _dense_fmts(kname)),
                ("taco_sparse", prepare_taco, SPARSE_FMTS[kname]),
                ("taco_dense", prepare_taco, _dense_fmts(kname)),
            ):
                p = prep(kname, coos, fmts, scalars or None)
                row[f"{label}_ms"] = round(
                    median_time(p.runner, repeat) * 1e3, 2
                )
            for system in ("scipy", "numpy"):
                r = baseline_runner(system, kname, coos, scalars)
                try:
                    row[f"{system}_ms"] = (
                        round(median_time(r, repeat) * 1e3, 2)
                        if r else "n/a"
                    )
                except MemoryError:
                    row[f"{system}_ms"] = "OOM"
            out.append(row)
    return out


def main(n: int = 160) -> list[dict]:
    r = rows(n)
    print_table("Fig. 8: runtime vs density, sparse and dense formats (ms)", r)
    return r


if __name__ == "__main__":
    main()
