"""Taco simulation: storage-fused compilation WITHOUT cost-based rewrites.

Taco (Kjolstad et al.) compiles the tensor expression *as written* into
loops merged with the chosen storage format; it "does not perform
cost-based optimizations" and leaves algebraic rewriting "to the
programmer" (paper Sec. 1). We reproduce that by running our own compile
pipeline with the factorization families (hoist/factor/D-rules) disabled:
fusion with the format still happens, the algebra is untouched. The
resulting plan executes on the same code generator as STOREL, so the
STOREL-vs-Taco gap isolates exactly what the paper claims — the value of
the cost-based rewrite rules (Sec. 6.1: "STOREL is always at least
competitive with Taco, and achieves significant performance improvements
for kernels that benefit from our factorization rewrite rules").
"""
from __future__ import annotations

from repro.core.compile import Compiled, Limits, compile_kernel
from repro.storage.formats import StoredTensor

# Taco compiles the expression into ONE merged loop nest over the chosen
# formats: guard motion (A6) and iteration-to-lookup fusion (F1-F4) model
# its iteration-graph merging, and scalar hoisting (A2-A4) its placement
# of compute at loop levels. What Taco cannot do is *reuse* sub-
# computations across iterations — the distributivity family D1-D4, which
# hoists whole sub-summations or materializes keyed partial aggregates.
# Excluding D1-D4 reproduces exactly the paper's Taco gap: parity on
# MMM/TTM, and an O(row-nnz)-factor loss on ΣMMM/BATAX/MTTKRP (Sec. 6.1).
TACO_FAMILIES = None  # all families
TACO_EXCLUDE = (
    "D1", "D1r", "D2", "D2r", "D3", "D3r", "D4", "D4r",
)


def compile_taco(
    kernel,
    stored: dict[str, StoredTensor],
    *,
    scalar_env: dict | None = None,
    limits: Limits | None = None,
) -> Compiled:
    """Compile ``kernel`` the way Taco would: format-fused, unfactorized."""
    return compile_kernel(
        kernel,
        stored,
        scalar_env=scalar_env,
        families=TACO_FAMILIES,
        exclude=TACO_EXCLUDE,
        limits=limits,
    )
