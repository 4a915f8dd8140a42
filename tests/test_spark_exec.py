"""Spark engine tests: every kernel's naive and optimized logical plans,
lowered to DataFrame DAGs, must match the DuckDB oracle exactly."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compile import Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.core.sumproduct import to_sumproduct
from repro.exec.spark_exec import coo_to_df, coo_to_pandas, run_sp
from repro.oracle import assert_equivalent
from repro.sdqlite.parser import parse
from repro.storage.coo import random_sparse
from repro.storage.formats import store

LIM = Limits(max_iters=8, max_nodes=8000, timeout_s=8)

SHAPES = {
    "MMM": {"A": (12, 10), "B": (10, 14)},
    "SumMMM": {"A": (12, 10), "B": (10, 14)},
    "BATAX": {"A": (12, 12), "x": (12,)},
    "TTM": {"A": (5, 4, 6), "B": (7, 6)},
    "MTTKRP": {"B": (5, 4, 6), "C": (4, 7), "D": (6, 7)},
}
FMTS = {
    "MMM": {"A": "csr", "B": "csr"},
    "SumMMM": {"A": "csr", "B": "csr"},
    "BATAX": {"A": "csr", "x": "dense"},
    "TTM": {"A": "csf", "B": "csr"},
    "MTTKRP": {"B": "csf", "C": "csr", "D": "csr"},
}


def _setup(kname, seed=0):
    k = KERNELS[kname]
    coos = {
        n: random_sparse(SHAPES[kname][n], 0.3, seed=seed + i)
        for i, (n, _r) in enumerate(k.tensors)
    }
    scal = {"beta": 2.0} if kname == "BATAX" else {}
    return k, coos, scal


def _oracle_tables(k, coos, scal):
    tables = {n: coo_to_pandas(c) for n, c in coos.items()}
    for s, v in scal.items():
        tables[s] = pd.DataFrame({"v": [v]})
    return tables


def _check(spark, k, plan, coos, scal):
    sp = to_sumproduct(plan, dict(k.tensors), set(k.scalars))
    rels = {n: coo_to_df(spark, c) for n, c in coos.items()}
    df = run_sp(sp, rels, scal, k.out_names)
    assert_equivalent(df, k.sql, **_oracle_tables(k, coos, scal))


@pytest.mark.parametrize("kname", sorted(KERNELS))
def test_naive_plan_on_spark_matches_oracle(kname, spark):
    k, coos, scal = _setup(kname)
    _check(spark, k, parse(k.tp_src), coos, scal)


@pytest.mark.parametrize("kname", sorted(KERNELS))
def test_optimized_plan_on_spark_matches_oracle(kname, spark):
    k, coos, scal = _setup(kname, seed=5)
    stored = {
        n: store(n, coos[n], FMTS[kname][n]) for n, _ in k.tensors
    }
    c = compile_kernel(k, stored, scalar_env=scal or None, limits=LIM)
    _check(spark, k, c.tp_plan, coos, scal)


def test_sumproduct_recognizes_factorized_shapes():
    # ΣMMM's factorized plan contains a correlated sub-aggregate.
    k, coos, scal = _setup("SumMMM")
    stored = {n: store(n, coos[n], "csr") for n, _ in k.tensors}
    c = compile_kernel(k, stored, limits=LIM)
    sp = to_sumproduct(c.tp_plan, dict(k.tensors), set(k.scalars))
    assert sp.out_keys == []
    assert sp.atoms or sp.subs


def test_atom_duplicate_key_is_diagonal_filter(spark):
    # sum(<(i,i),a> in A) { i -> a } selects the diagonal.
    src = "sum(<(i,i2),a> in A) if (i == i2) then { i -> a }"
    e = parse(src)
    sp = to_sumproduct(e, {"A": 2})
    coo = random_sparse((6, 6), 0.5, seed=3)
    df = run_sp(sp, {"A": coo_to_df(spark, coo)}, {}, ("i",))
    got = {int(r["i"]): r["v"] for r in df.collect()}
    dense = coo.to_dense()
    want = {i: dense[i, i] for i in range(6) if dense[i, i] != 0}
    assert got.keys() == want.keys()
    assert all(abs(got[i] - want[i]) < 1e-9 for i in got)


def test_scalar_factor_lands_in_product(spark):
    src = "sum(<i,v> in x) beta * v"
    sp = to_sumproduct(parse(src), {"x": 1}, {"beta"})
    coo = random_sparse((8,), 0.5, seed=4)
    df = run_sp(sp, {"x": coo_to_df(spark, coo)}, {"beta": 10.0})
    [row] = df.collect()
    assert row["v"] == pytest.approx(10.0 * coo.vals.sum())
