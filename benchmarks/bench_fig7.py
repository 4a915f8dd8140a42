"""Benchmark: Fig. 7 — kernel runtimes on a Table-2 analog (pdb1HYS for
matrices, NIPS for rank-3 tensors) across systems. The paper's headline
shape: STOREL ≈ Taco on MMM/TTM, STOREL faster on ΣMMM/BATAX/MTTKRP,
DuckDB slow on the factorizable kernels."""
import pytest

from repro.experiments.fig7 import STOREL_FMTS, TACO_FMTS, _data_for
from repro.experiments.runners import (
    baseline_runner, prepare_storel, prepare_taco,
)

MAT_DS, TEN_DS = "pdb1HYS", "NIPS"
SCALE = 1 / 20


def _dataset(kname):
    return MAT_DS if kname in ("MMM", "SumMMM", "BATAX") else TEN_DS


@pytest.fixture(scope="module")
def data():
    out = {}
    for kname in ("MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"):
        out[kname] = _data_for(kname, _dataset(kname), SCALE)
    return out


@pytest.mark.parametrize("kname",
                         ["MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"])
def test_storel(benchmark, data, kname):
    coos, scal = data[kname]
    p = prepare_storel(kname, coos, STOREL_FMTS[kname], scal or None)
    benchmark(p.runner)


@pytest.mark.parametrize("kname",
                         ["MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"])
def test_taco(benchmark, data, kname):
    coos, scal = data[kname]
    p = prepare_taco(kname, coos, TACO_FMTS[kname], scal or None)
    benchmark(p.runner)


@pytest.mark.parametrize("kname",
                         ["MMM", "SumMMM", "BATAX", "TTM", "MTTKRP"])
def test_duckdb(benchmark, data, kname):
    coos, scal = data[kname]
    benchmark(baseline_runner("duckdb", kname, coos, scal))


@pytest.mark.parametrize("kname", ["MMM", "SumMMM", "BATAX"])
def test_scipy_like(benchmark, data, kname):
    coos, scal = data[kname]
    benchmark(baseline_runner("scipy", kname, coos, scal))


@pytest.mark.parametrize("kname", ["MMM", "SumMMM", "BATAX"])
def test_torch_tf_sim(benchmark, data, kname):
    coos, scal = data[kname]
    benchmark(baseline_runner("torch_tf", kname, coos, scal))
