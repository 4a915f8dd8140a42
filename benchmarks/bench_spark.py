"""Benchmark: the PySpark engine — naive vs factorized DataFrame DAGs for
ΣMMM and BATAX at SF=0.1-scale data, and the executor-level per-partition
storage-format kernels (csr vs dense layouts)."""
import pytest

from repro.core.compile import Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.core.sumproduct import to_sumproduct
from repro.exec.partitioned import per_partition_batax, per_partition_mmm
from repro.exec.spark_exec import coo_to_df, run_sp
from repro.sdqlite.parser import parse
from repro.storage.coo import random_sparse
from repro.storage.formats import store
from repro.synth_tensors import sf_matrix, sf_vector

SF = 0.1
LIM = Limits(max_iters=8, max_nodes=12_000, timeout_s=8)


@pytest.fixture(scope="module")
def data(spark):
    A = sf_matrix(SF, seed=1)
    n = A.shape[1]
    B = random_sparse((n, 250), 2 ** -5, seed=2)
    x = sf_vector(n, seed=3)
    rels = {
        "A": coo_to_df(spark, A).cache(),
        "B": coo_to_df(spark, B).cache(),
        "x": coo_to_df(spark, x).cache(),
    }
    for df in rels.values():
        df.count()
    return A, B, x, rels


def _sp(kname, plan_kind):
    k = KERNELS[kname]
    if plan_kind == "naive":
        plan = parse(k.tp_src)
    else:
        coos = {"A": sf_matrix(0.001, seed=1)}
        if kname == "SumMMM":
            coos["B"] = random_sparse((coos["A"].shape[1], 250), 2 ** -5, 2)
            fmts = {"A": "csc", "B": "csr"}
            scal = None
        else:
            coos["x"] = sf_vector(coos["A"].shape[1], 3)
            fmts = {"A": "csr", "x": "dense"}
            scal = {"beta": 2.0}
        stored = {n: store(n, coos[n], fmts[n]) for n, _ in k.tensors}
        plan = compile_kernel(
            k, stored, scalar_env=scal, limits=LIM
        ).tp_plan
    return to_sumproduct(plan, dict(k.tensors), set(k.scalars))


@pytest.mark.parametrize("plan_kind", ["naive", "optimized"])
@pytest.mark.parametrize("kname", ["SumMMM", "BATAX"])
def test_spark_kernel(benchmark, spark, data, kname, plan_kind):
    _A, _B, _x, rels = data
    sp = _sp(kname, plan_kind)
    scal = {"beta": 2.0} if kname == "BATAX" else {}
    k = KERNELS[kname]

    def run():
        run_sp(sp, rels, scal, k.out_names).count()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("fmt", ["csr", "dense"])
def test_partitioned_mmm(benchmark, spark, data, fmt):
    A, B, _x, _rels = data

    def run():
        per_partition_mmm(spark, A, B, fmt=fmt).count()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("fmt", ["csr", "dense"])
def test_partitioned_batax(benchmark, spark, data, fmt):
    A, _B, x, _rels = data
    xd = x.to_dense()

    def run():
        per_partition_batax(spark, A, xd, 2.0, fmt=fmt).count()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
