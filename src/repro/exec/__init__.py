"""Execution engines for optimized physical plans.

codegen     -- generates Python loop nests (the paper's Julia substitute)
spark_exec  -- lowers the sum-product IR to a PySpark DataFrame DAG
partitioned -- format-tagged per-partition kernels via mapInPandas
"""
from repro.exec.codegen import compile_plan, run_plan  # noqa: F401
