"""Executor-level per-partition storage formats: both layouts must agree
with the dense reference and the DuckDB oracle at every density."""
import numpy as np
import pytest

from repro.core import reference as ref
from repro.exec.partitioned import per_partition_batax, per_partition_mmm
from repro.exec.spark_exec import coo_to_pandas
from repro.oracle import assert_equivalent
from repro.storage.coo import random_sparse


@pytest.mark.parametrize("fmt", ["csr", "dense"])
@pytest.mark.parametrize("density", [0.05, 0.5])
def test_per_partition_mmm(spark, fmt, density):
    A = random_sparse((30, 24), density, seed=1)
    B = random_sparse((24, 28), density, seed=2)
    df = per_partition_mmm(spark, A, B, fmt=fmt, num_parts=4)
    got = np.zeros((30, 28))
    for r in df.collect():
        got[r["i1"], r["i2"]] = r["v"]
    assert np.allclose(got, ref.mmm(A.to_dense(), B.to_dense()))


@pytest.mark.parametrize("fmt", ["csr", "dense"])
def test_per_partition_mmm_oracle(spark, fmt):
    A = random_sparse((20, 16), 0.3, seed=3)
    B = random_sparse((16, 18), 0.3, seed=4)
    df = per_partition_mmm(spark, A, B, fmt=fmt, num_parts=4)
    assert_equivalent(
        df.withColumnRenamed("i1", "i").withColumnRenamed("i2", "k"),
        """
        SELECT A.i1 AS i, B.i2 AS k, SUM(A.v * B.v) AS v
        FROM A JOIN B ON A.i2 = B.i1 GROUP BY A.i1, B.i2
        """,
        A=coo_to_pandas(A),
        B=coo_to_pandas(B),
    )


@pytest.mark.parametrize("fmt", ["csr", "dense"])
@pytest.mark.parametrize("density", [0.05, 0.4])
def test_per_partition_batax(spark, fmt, density):
    A = random_sparse((40, 32), density, seed=5)
    x = random_sparse((32,), 1.0, seed=6).to_dense()
    df = per_partition_batax(spark, A, x, beta=2.5, fmt=fmt, num_parts=4)
    got = np.zeros(32)
    for r in df.collect():
        got[r["i1"]] = r["v"]
    assert np.allclose(got, ref.batax(2.5, A.to_dense(), x))


def test_partition_count_does_not_change_result(spark):
    A = random_sparse((25, 25), 0.2, seed=7)
    B = random_sparse((25, 25), 0.2, seed=8)
    outs = []
    for parts in (1, 7):
        df = per_partition_mmm(spark, A, B, fmt="csr", num_parts=parts)
        outs.append(
            sorted((r["i1"], r["i2"], round(r["v"], 9)) for r in df.collect())
        )
    assert outs[0] == outs[1]
