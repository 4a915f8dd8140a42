"""Benchmark: Table 4 — the cost of the two-stage rewrite-based
optimization itself (our Egg-substitute's saturation + extraction)."""
import pytest

from repro.core.compile import Limits, compile_kernel
from repro.core.kernels import KERNELS
from repro.experiments.table3 import make_data
from repro.experiments.table4 import FMTS
from repro.storage.formats import store

LIM = Limits(max_iters=8, max_nodes=12_000, timeout_s=8)


@pytest.mark.parametrize("kname", ["BATAX", "SumMMM", "MMM"])
def test_optimize(benchmark, kname):
    coos, scal = make_data(kname, 200)
    kernel = KERNELS[kname]

    def compile_once():
        stored = {
            n: store(n, coos[n], FMTS[kname][n]) for n, _ in kernel.tensors
        }
        return compile_kernel(
            kernel, stored, scalar_env=scal or None, limits=LIM
        )

    benchmark(compile_once)
