"""Smoke tests for the per-table/figure experiment harnesses (tiny sizes):
each must produce well-formed rows with the expected columns, and the
headline orderings must hold at small scale."""
import pytest

from repro.experiments import fig8, fig9, fig10, table2, table3, table4


def test_table2_rows_cover_all_datasets():
    rows = table2.rows()
    assert len(rows) == 10
    names = {r["tensor"] for r in rows}
    assert {"cant", "webbase", "NIPS", "Enron"} <= names
    for r in rows:
        assert r["nnz"] > 0 and float(r["density"]) > 0


def test_table3_rows_small():
    rows = table3.rows(n=80, repeat=1)
    kernels = {r["kernel"] for r in rows}
    assert kernels == {"MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"}
    systems = {r["system"] for r in rows}
    assert {"storel", "taco", "duckdb", "numpy"} <= systems
    storel = [r for r in rows if r["system"] == "storel"]
    assert all(isinstance(r["time_ms"], float) for r in storel)


def test_table4_rows_two_stages_each():
    rows = table4.rows(n=60)
    assert len(rows) == 10  # 5 kernels x 2 stages
    for r in rows:
        assert r["iters"] >= 1 and r["nodes"] > 0
        assert r["memos"] >= r["nodes"]


def test_fig8_rows_have_both_formats():
    rows = fig8.rows(n=40, densities=[2 ** -4, 2 ** -2], repeat=1)
    assert len(rows) == 6  # 3 kernels x 2 densities
    for r in rows:
        for col in ("storel_sparse_ms", "storel_dense_ms",
                    "taco_sparse_ms", "taco_dense_ms"):
            assert isinstance(r[col], float)


def test_fig9_ablation_ordering():
    rows = fig9.rows(n=300, densities=[2 ** -5], repeat=1)
    [r] = rows
    # full factorization must not be slower than no factorization (hash)
    assert r["hash_full_ms"] <= r["hash_none_ms"] * 1.5
    # fusion must not be slower than materialize-then-run (csr)
    assert r["csr_fused_ms"] <= r["csr_nofuse_ms"] * 1.5


def test_fig10_rows_small():
    rows = fig10.rows(n_values=(100, 1000), repeat=1)
    assert len(rows) == 2
    for r in rows:
        assert "full_total_ms" in r and "unoptimized_total_ms" in r
