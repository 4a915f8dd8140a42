"""Benchmark: Fig. 8 — sparse vs dense storage formats at two densities
(crossover behaviour) for the MMM and BATAX kernels."""
import pytest

from repro.experiments.fig8 import SPARSE_FMTS, _data, _dense_fmts
from repro.experiments.runners import prepare_storel

N = 100  # dense-format MMM is O(N^3) in pure Python loops


@pytest.mark.parametrize("density", [2 ** -6, 2 ** -2])
@pytest.mark.parametrize("layout", ["sparse", "dense"])
@pytest.mark.parametrize("kname", ["MMM", "BATAX"])
def test_storel_format(benchmark, kname, layout, density):
    coos, scal = _data(kname, N, density)
    fmts = SPARSE_FMTS[kname] if layout == "sparse" else _dense_fmts(kname)
    p = prepare_storel(kname, coos, fmts, scal or None)
    benchmark(p.runner)
