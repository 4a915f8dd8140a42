"""Spark-submit entrypoint: run every kernel's naive and optimized logical
plans as PySpark DataFrame DAGs over COO relations, plus the per-partition
storage-format kernels, and print runtimes.

Usage: spark-submit jobs/spark_kernels.py [sf]
  sf: scale factor (default 0.1 — ~100k..1M nonzeros in the main tensor)
"""
import sys
import time

from pyspark.sql import SparkSession

from repro.core.compile import Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.core.sumproduct import to_sumproduct
from repro.exec.partitioned import per_partition_batax, per_partition_mmm
from repro.exec.spark_exec import coo_to_df, run_sp
from repro.sdqlite.parser import parse
from repro.storage.coo import random_sparse
from repro.storage.formats import store
from repro.synth_tensors import sf_matrix, sf_vector


def main(spark: SparkSession, sf: float) -> None:
    A = sf_matrix(sf, seed=1)
    n = A.shape[1]
    data = {
        "MMM": ({"A": A, "B": random_sparse((n, 250), 2 ** -5, seed=2)}, {}),
        "SumMMM": ({"A": A, "B": random_sparse((n, 250), 2 ** -5, seed=2)}, {}),
        "BATAX": ({"A": A, "x": sf_vector(n, seed=3)}, {"beta": 2.0}),
    }
    fmts = {"MMM": {"A": "csr", "B": "csr"},
            "SumMMM": {"A": "csc", "B": "csr"},
            "BATAX": {"A": "csr", "x": "dense"}}
    lim = Limits(max_iters=8, max_nodes=12_000, timeout_s=8)
    print(f"sf={sf}  A: {A.shape} nnz={A.nnz}")
    for kname, (coos, scal) in data.items():
        k = KERNELS[kname]
        rels = {t: coo_to_df(spark, c).cache() for t, c in coos.items()}
        for df in rels.values():
            df.count()  # materialize caches; load time excluded
        stored = {t: store(t, coos[t], fmts[kname][t]) for t, _ in k.tensors}
        c = compile_kernel(k, stored, scalar_env=scal or None, limits=lim)
        for label, plan in (("naive", parse(k.tp_src)),
                            ("optimized", c.tp_plan)):
            sp = to_sumproduct(plan, dict(k.tensors), set(k.scalars))
            t0 = time.perf_counter()
            out = run_sp(sp, rels, scal, k.out_names)
            cnt = out.count()
            dt = time.perf_counter() - t0
            print(f"{kname:8s} {label:9s} rows={cnt:8d} {dt * 1e3:9.1f} ms")
    # per-partition storage formats (executor-level layout choice)
    B = random_sparse((n, 250), 2 ** -5, seed=2)
    x = sf_vector(n, seed=3).to_dense()
    for fmt in ("csr", "dense"):
        t0 = time.perf_counter()
        per_partition_mmm(spark, A, B, fmt=fmt).count()
        t1 = time.perf_counter()
        per_partition_batax(spark, A, x, 2.0, fmt=fmt).count()
        t2 = time.perf_counter()
        print(f"partitioned {fmt:6s} MMM {1e3 * (t1 - t0):9.1f} ms   "
              f"BATAX {1e3 * (t2 - t1):9.1f} ms")


if __name__ == "__main__":
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.1
    spark = (
        SparkSession.builder.appName("repro-kernels")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    try:
        main(spark, sf)
    finally:
        spark.stop()
