"""Table 3 reproduction: best storage format per (kernel, system).

For STOREL and the Taco simulation, every candidate format combination is
compiled and timed and the argmin is reported — this *measures* the "best
storage formats we found for each considered tensor program and system"
(Sec. 6.1). Systems with a fixed storage model (SciPy=CSR, NumPy=Dense,
PyTorch/TF=CSR+Dense, DuckDB=COO) report that model, timed once.
"""
from __future__ import annotations

from repro.experiments.runners import (
    baseline_runner, median_time, prepare_storel, prepare_taco, print_table,
)
from repro.storage.coo import random_sparse
from repro.synth_tensors import sf_vector

# candidate formats per kernel, in (tensor order of Kernel.tensors)
CANDIDATES = {
    "MMM": [("csr", "csr"), ("csr", "csc"), ("dcsr", "csr"),
            ("coo", "coo"), ("hash", "hash")],
    "SumMMM": [("csc", "csr"), ("csr", "csr"), ("dcsr", "csr"),
               ("coo", "coo"), ("hash", "hash")],
    "BATAX": [("csr", "dense"), ("dcsr", "dense"), ("hash", "dense"),
              ("csc", "dense")],
    "TTM": [("csf", "csc"), ("csf", "csr"), ("coo", "coo"),
            ("hash", "hash")],
    "MTTKRP": [("csf", "csr", "csc"), ("csf", "csr", "csr"),
               ("coo", "coo", "coo"), ("hash", "hash", "hash")],
}

# the paper's Table 3 (STOREL / Taco column), for side-by-side reporting
PAPER_BEST = {
    "MMM": "csr,csr",
    "SumMMM": "csc,csr",
    "BATAX": "csr,dense",
    "TTM": "csf,csc",
    "MTTKRP": "csf,csr,csc",
}

FIXED_SYSTEMS = {
    "scipy": "csr (fixed)",
    "numpy": "dense (fixed)",
    "torch_tf": "csr+dense (fixed)",
    "duckdb": "coo relations (fixed)",
}

DENSITY = 2 ** -5  # Sec. 6.1: synthetic matrices use sparsity 2^-5


def make_data(kname: str, n: int = 600, seed: int = 0):
    """Sec.-6.1-shaped synthetic data: the main tensor n x n (or rank 3),
    the others per Table 3's dimension column (width 250 / 25)."""
    if kname in ("MMM", "SumMMM"):
        return {
            "A": random_sparse((n, n), DENSITY, seed=seed),
            "B": random_sparse((n, 250), DENSITY, seed=seed + 1),
        }, {}
    if kname == "BATAX":
        return {
            "A": random_sparse((n, n), DENSITY, seed=seed),
            "x": sf_vector(n, seed=seed + 1),
        }, {"beta": 2.0}
    n3 = max(24, n // 8)
    if kname == "TTM":
        return {
            "A": random_sparse((n3, n3, n3), DENSITY, seed=seed),
            "B": random_sparse((25, n3), DENSITY, seed=seed + 1),
        }, {}
    return {
        "B": random_sparse((n3, n3, n3), DENSITY, seed=seed),
        "C": random_sparse((n3, 25), DENSITY, seed=seed + 1),
        "D": random_sparse((n3, 25), DENSITY, seed=seed + 2),
    }, {}


def best_format(kname: str, prepare, coos, scalars, repeat=3):
    """Sweep candidate formats; return (formats, seconds) of the argmin."""
    from repro.core.kernels import KERNELS
    names = [n for n, _ in KERNELS[kname].tensors]
    best = None
    for fmts in CANDIDATES[kname]:
        p = prepare(kname, coos, dict(zip(names, fmts)), scalars or None)
        t = median_time(p.runner, repeat)
        if best is None or t < best[1]:
            best = (",".join(fmts), t)
    return best


def rows(n: int = 600, repeat: int = 3) -> list[dict]:
    out = []
    for kname in ("MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"):
        coos, scalars = make_data(kname, n)
        for system in ("storel", "taco"):
            prep = prepare_storel if system == "storel" else prepare_taco
            fmts, t = best_format(kname, prep, coos, scalars, repeat)
            out.append({
                "kernel": kname, "system": system, "best_format": fmts,
                "time_ms": round(t * 1e3, 2),
                "paper_best": PAPER_BEST[kname],
            })
        for system, fixed in FIXED_SYSTEMS.items():
            r = baseline_runner(system, kname, coos, scalars)
            if r is None:
                out.append({
                    "kernel": kname, "system": system, "best_format": "-",
                    "time_ms": "n/a", "paper_best": "-",
                })
                continue
            try:
                t = median_time(r, repeat)
                tms = round(t * 1e3, 2)
            except MemoryError:
                tms = "OOM"
            out.append({
                "kernel": kname, "system": system, "best_format": fixed,
                "time_ms": tms, "paper_best": "-",
            })
    return out


def main(n: int = 600) -> list[dict]:
    r = rows(n)
    print_table(f"Table 3: best storage formats (n={n})", r)
    return r


if __name__ == "__main__":
    main()
