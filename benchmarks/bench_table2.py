"""Benchmark: Table-2 dataset analog generation + storage construction."""
import pytest

from repro.storage.formats import store
from repro.synth_tensors import analog


@pytest.mark.parametrize("name", ["cant", "webbase", "NIPS"])
def test_generate_analog(benchmark, name):
    benchmark(lambda: analog(name))


def test_build_csr_cant(benchmark):
    coo = analog("cant")
    benchmark(lambda: store("A", coo, "csr"))


def test_build_csf_nips(benchmark):
    coo = analog("NIPS")
    benchmark(lambda: store("B", coo, "csf"))
