"""Benchmark: Table 3 — each kernel under its best measured storage format,
STOREL vs the Taco simulation (compilation excluded, paper methodology)."""
import pytest

from repro.experiments.runners import prepare_storel, prepare_taco
from repro.experiments.table3 import make_data

N = 400

FMTS = {
    "MMM": {"A": "csr", "B": "csr"},
    "SumMMM": {"A": "csc", "B": "csr"},
    "BATAX": {"A": "csr", "x": "dense"},
    "TTM": {"A": "csf", "B": "csc"},
    "MTTKRP": {"B": "csf", "C": "csr", "D": "csc"},
}


@pytest.fixture(scope="module")
def prepared():
    out = {}
    for kname, fmts in FMTS.items():
        coos, scal = make_data(kname, N)
        out[(kname, "storel")] = prepare_storel(
            kname, coos, fmts, scal or None
        )
        out[(kname, "taco")] = prepare_taco(kname, coos, fmts, scal or None)
    return out


@pytest.mark.parametrize("kname", sorted(FMTS))
@pytest.mark.parametrize("system", ["storel", "taco"])
def test_kernel(benchmark, prepared, kname, system):
    benchmark(prepared[(kname, system)].runner)
