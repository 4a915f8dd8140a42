"""DuckDB baseline: tensors as COO relations, kernels as join-aggregate SQL.

The paper (Sec. 6.1): "DuckDB does not push the summation past the join"
and "uses binary join plans which construct costly intermediate results" —
running the kernel's naive SQL reproduces exactly that behaviour.
"""
from __future__ import annotations

import time

import duckdb
import pandas as pd

from repro.exec.spark_exec import coo_to_pandas
from repro.storage.coo import COO


def run_duckdb(
    kernel, coos: dict[str, COO], scalars: dict[str, float] | None = None
) -> pd.DataFrame:
    """Run the kernel's naive SQL over in-memory COO relations."""
    con = duckdb.connect()
    try:
        for name, coo in coos.items():
            con.register(name, coo_to_pandas(coo))
        for name, v in (scalars or {}).items():
            con.register(name, pd.DataFrame({"v": [float(v)]}))
        return con.execute(kernel.sql).fetchdf()
    finally:
        con.close()


def time_duckdb(kernel, coos, scalars=None, repeat: int = 3) -> float:
    """Median wall-clock seconds over ``repeat`` runs (data pre-registered,
    matching the paper's 'execution time only' methodology)."""
    con = duckdb.connect()
    try:
        for name, coo in coos.items():
            con.register(name, coo_to_pandas(coo))
        for name, v in (scalars or {}).items():
            con.register(name, pd.DataFrame({"v": [float(v)]}))
        times = []
        for _ in range(repeat):
            t0 = time.perf_counter()
            con.execute(kernel.sql).fetchall()
            times.append(time.perf_counter() - t0)
        return sorted(times)[len(times) // 2]
    finally:
        con.close()
