"""Comparator systems for the Sec. 6 evaluation.

Real systems where available in this container (DuckDB, NumPy); faithful
simulations elsewhere (SciPy / PyTorch / TensorFlow are not installed, and
Taco is a C++ compiler) — each simulation reproduces the *architectural*
property the paper attributes to the system (see DESIGN.md Sec. 2):

  duckdb_rel    real DuckDB over COO relations, naive join-aggregate SQL
  numpy_dense   real NumPy, dense-only kernels (OOM guard emulates the
                paper's out-of-memory failures)
  scipy_like    fixed, vectorized CSR primitives composed with
                materialized intermediates (SciPy's architecture)
  torch_tf_sim  only a sparse-times-dense matmul primitive (footnote 3),
                everything else via dense intermediates
  taco_sim      our own pipeline with storage fusion but WITHOUT the
                factorization rule families — Taco compiles the expression
                as written against the format, with no cost-based
                algebraic rewriting
"""
