"""STOREL's core: the five tensor programs (Table 3), the two-stage
cost-based compile pipeline (Sec. 5 / 6.4), and the sum-product IR used by
the execution engines."""
from repro.core.kernels import KERNELS, Kernel  # noqa: F401
from repro.core.compile import Compiled, compile_kernel  # noqa: F401
