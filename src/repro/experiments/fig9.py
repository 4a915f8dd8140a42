"""Fig. 9 reproduction (as a table): contribution of factorization and
fusion rule families on the BATAX kernel (Sec. 6.3), A is 10^3 x 10^3.

Variants (matching the paper's lines):
  hash_none    hash-map storage, no factorization (the green baseline)
  hash_fac1    hash-map, only the first factorization (D4 hoisting; the
               D2/D3/D1 sum-hoisting rules disabled)
  hash_full    hash-map, full factorization (blue/orange lines)
  csr_nofuse   CSR storage, factorization but NO fusion rules — the plan
               must materialize the storage mapping first (dashed upper)
  csr_fused    CSR storage, factorization + fusion (dashed lower, best)
"""
from __future__ import annotations

from repro.experiments.runners import median_time, prepare_storel, print_table
from repro.storage.coo import random_sparse
from repro.synth_tensors import sf_vector, sweep_densities

NO_FACTOR = ["assoc", "comm", "simplify", "fusion", "dict"]
FAC1_EXCLUDE = ("D1", "D1r", "D2", "D2r", "D3", "D3r")  # keep only D4
NO_FUSION = ["assoc", "comm", "hoist", "simplify", "factor", "dict"]

VARIANTS = [
    # label, format of A, families, exclude, plan_attr
    ("hash_none", "hash", NO_FACTOR, (), "plan"),
    ("hash_fac1", "hash", None, FAC1_EXCLUDE, "plan"),
    ("hash_full", "hash", None, (), "plan"),
    ("csr_nofuse", "csr", NO_FUSION, (), "plan"),
    ("csr_fused", "csr", None, (), "plan"),
]


def rows(n: int = 1000, densities=None, repeat: int = 3) -> list[dict]:
    out = []
    for d in densities or sweep_densities(-10, -4):
        A = random_sparse((n, n), d, seed=1)
        coos = {"A": A, "x": sf_vector(n, seed=2)}
        row = {"density": f"{d:.1e}", "nnz": A.nnz}
        for label, fmt, fams, excl, attr in VARIANTS:
            p = prepare_storel(
                "BATAX", coos, {"A": fmt, "x": "dense"}, {"beta": 2.0},
                families=fams, exclude=excl, plan_attr=attr,
            )
            row[f"{label}_ms"] = round(median_time(p.runner, repeat) * 1e3, 2)
        out.append(row)
    return out


def main(n: int = 1000) -> list[dict]:
    r = rows(n)
    print_table(
        "Fig. 9: BATAX rule-family ablation, runtime (ms) vs density", r
    )
    return r


if __name__ == "__main__":
    main()
