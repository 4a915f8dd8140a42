"""Executor-level storage formats: per-partition tensor layouts.

The calibration note for this paper suggests expressing the storage-format
choice "as a per-partition tensor storage format chosen at executor
level". This module does exactly that: a tensor arrives as a coordinate
DataFrame, is hash-partitioned by its leading index, and *inside each
partition* (``mapInPandas``, running on executors) the rows are laid out
in the chosen format — CSR segment arrays or a dense block — before a
vectorized NumPy kernel runs on that layout. The driver only sees
coordinate partials, which a final groupBy-sum combines.

Kernels provided: MMM (C = A @ B) and BATAX (q = beta * A^T (A x)) —
the two kernels the paper uses for its storage-sensitivity study (Sec 6.2).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.storage.coo import COO

_OUT2 = "i1 long, i2 long, v double"
_OUT1 = "i1 long, v double"


def _part_layout(pdf: pd.DataFrame, ncols: int, fmt: str):
    """Lay one partition's coordinate rows out in ``fmt``.

    Returns (row_ids, layout) where layout is CSR-style (pos, idx, val)
    for "csr" or a dense block (len(row_ids) x ncols) for "dense".
    """
    pdf = pdf.sort_values(["i1", "i2"])
    rows, inv = np.unique(pdf["i1"].to_numpy(), return_inverse=True)
    cols = pdf["i2"].to_numpy()
    vals = pdf["v"].to_numpy()
    if fmt == "dense":
        block = np.zeros((len(rows), ncols))
        block[inv, cols] = vals
        return rows, block
    counts = np.bincount(inv, minlength=len(rows))
    pos = np.zeros(len(rows) + 1, dtype=np.int64)
    np.cumsum(counts, out=pos[1:])
    return rows, (pos, cols, vals)


def per_partition_mmm(
    spark: SparkSession,
    A: COO,
    B: COO,
    fmt: str = "csr",
    num_parts: int = 8,
) -> DataFrame:
    """C(i,k) = sum_j A(i,j) B(j,k), with A laid out per partition in
    ``fmt`` on the executors and B shipped to every executor in CSR."""
    m, n = A.shape
    n2, p = B.shape
    assert n == n2
    b_csr = _part_layout(
        pd.DataFrame({"i1": B.coords[:, 0], "i2": B.coords[:, 1],
                      "v": B.vals}),
        p, "csr",
    )
    bc = spark.sparkContext.broadcast((b_csr, n, p))

    def kernel(parts: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        (b_rows, (b_pos, b_idx, b_val)), n_, p_ = bc.value
        # dense row lookup: position of j in b_rows (or -1)
        b_lookup = np.full(n_, -1, dtype=np.int64)
        b_lookup[b_rows] = np.arange(len(b_rows))
        for pdf in parts:
            if not len(pdf):
                continue
            rows, layout = _part_layout(pdf, n_, fmt)
            out_i, out_k, out_v = [], [], []
            if fmt == "dense":
                # dense block x CSR-B accumulated into a dense slab
                acc = np.zeros((len(rows), p_))
                for jj in range(n_):
                    bj = b_lookup[jj]
                    if bj < 0:
                        continue
                    s, e = b_pos[bj], b_pos[bj + 1]
                    acc += np.outer(layout[:, jj], _scatter(
                        b_idx[s:e], b_val[s:e], p_))
                nzi, nzk = np.nonzero(acc)
                out_i = rows[nzi]
                out_k = nzk
                out_v = acc[nzi, nzk]
            else:
                pos, cols, vals = layout
                for r in range(len(rows)):
                    accr = np.zeros(p_)
                    for t in range(pos[r], pos[r + 1]):
                        bj = b_lookup[cols[t]]
                        if bj < 0:
                            continue
                        s, e = b_pos[bj], b_pos[bj + 1]
                        accr[b_idx[s:e]] += vals[t] * b_val[s:e]
                    nz = np.nonzero(accr)[0]
                    out_i.extend([rows[r]] * len(nz))
                    out_k.extend(nz.tolist())
                    out_v.extend(accr[nz].tolist())
            yield pd.DataFrame(
                {"i1": np.asarray(out_i, dtype=np.int64),
                 "i2": np.asarray(out_k, dtype=np.int64),
                 "v": np.asarray(out_v, dtype=np.float64)}
            )

    a_df = spark.createDataFrame(
        pd.DataFrame({"i1": A.coords[:, 0], "i2": A.coords[:, 1],
                      "v": A.vals})
    )
    partials = a_df.repartition(num_parts, "i1").mapInPandas(kernel, _OUT2)
    from pyspark.sql import functions as F

    return partials.groupBy("i1", "i2").agg(F.sum("v").alias("v"))


def _scatter(idx: np.ndarray, val: np.ndarray, width: int) -> np.ndarray:
    out = np.zeros(width)
    out[idx] = val
    return out


def per_partition_batax(
    spark: SparkSession,
    A: COO,
    x: np.ndarray,
    beta: float,
    fmt: str = "csr",
    num_parts: int = 8,
) -> DataFrame:
    """q(j) = beta * sum_{i,k} A(i,j) A(i,k) x(k), factorized per
    partition: each executor computes t_i = <A_i, x> for its rows, then
    the partial q_j contributions beta * A(i,j) t_i; a groupBy-sum merges
    the partials across partitions."""
    m, n = A.shape
    bc = spark.sparkContext.broadcast((np.asarray(x, dtype=np.float64),
                                       float(beta), n))

    def kernel(parts: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        xv, b, n_ = bc.value
        for pdf in parts:
            if not len(pdf):
                continue
            rows, layout = _part_layout(pdf, n_, fmt)
            if fmt == "dense":
                t = layout @ xv
                q = b * (layout.T @ t)
                nz = np.nonzero(q)[0]
                yield pd.DataFrame({"i1": nz, "v": q[nz]})
                continue
            pos, cols, vals = layout
            q = np.zeros(n_)
            for r in range(len(rows)):
                s, e = pos[r], pos[r + 1]
                t = float(vals[s:e] @ xv[cols[s:e]])
                q[cols[s:e]] += b * vals[s:e] * t
            nz = np.nonzero(q)[0]
            yield pd.DataFrame({"i1": nz, "v": q[nz]})

    a_df = spark.createDataFrame(
        pd.DataFrame({"i1": A.coords[:, 0], "i2": A.coords[:, 1],
                      "v": A.vals})
    )
    partials = a_df.repartition(num_parts, "i1").mapInPandas(kernel, _OUT1)
    from pyspark.sql import functions as F

    return partials.groupBy("i1").agg(F.sum("v").alias("v"))
