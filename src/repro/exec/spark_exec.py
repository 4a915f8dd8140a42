"""PySpark executor for the sum-product IR.

Tensors are coordinate relations (``i1..id, v``). An :class:`SP` becomes a
DataFrame DAG: correlated sub-aggregates run first (aggregation *below*
the join — the relational image of the paper's factorization rules), then
atoms and sub-aggregate results natural-join on shared index variables,
the factors multiply, and a groupBy-sum produces the output tensor.

All plans run through the Catalyst path (DataFrame API, shuffle joins —
broadcast is disabled by the session fixture), so the factorized-vs-naive
comparison measures real join/aggregation work, not driver-side shortcuts.
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.sumproduct import SP, Atom
from repro.storage.coo import COO


def _san(name: str) -> str:
    return re.sub(r"[^0-9a-zA-Z_]", "_", name)


def coo_to_pandas(coo: COO) -> pd.DataFrame:
    """COO -> pandas relation with columns i1..id, v."""
    data = {
        f"i{d + 1}": coo.coords[:, d] for d in range(coo.rank)
    }
    data["v"] = coo.vals
    return pd.DataFrame(data)


def coo_to_df(spark: SparkSession, coo: COO) -> DataFrame:
    return spark.createDataFrame(coo_to_pandas(coo))


def _atom_df(rels: dict[str, DataFrame], atom: Atom) -> DataFrame:
    df = rels[atom.tensor]
    # Rename index columns to (sanitized) variable names. A variable that
    # appears twice within one atom (e.g. the diagonal A(i,i)) becomes an
    # intra-atom equality filter.
    sel = []
    seen: dict[str, str] = {}
    filters = []
    for pos, key in enumerate(atom.keys):
        col = f"i{pos + 1}"
        name = _san(key)
        if name in seen:
            tmp = f"__dup{pos}"
            sel.append(F.col(col).alias(tmp))
            filters.append((name, tmp))
        else:
            seen[name] = col
            sel.append(F.col(col).alias(name))
    if atom.val is not None:
        sel.append(F.col("v").alias(_san(atom.val)))
    out = df.select(*sel)
    for name, tmp in filters:
        out = out.filter(F.col(name) == F.col(tmp)).drop(tmp)
    # A *partial* access (fewer keys than the tensor's rank, value unused)
    # iterates the distinct prefixes — e.g. the non-empty rows of B — so
    # the coordinate relation must be de-duplicated, not row-multiplied.
    rank = sum(1 for c in df.columns if c.startswith("i"))
    if atom.val is None and len(atom.keys) < rank:
        out = out.distinct()
    return out


def run_sp(
    sp: SP,
    rels: dict[str, DataFrame],
    scalars: dict[str, float] | None = None,
    out_names: tuple[str, ...] = (),
) -> DataFrame:
    """Execute the sum-product plan; returns a DataFrame with the output
    index columns (named by ``out_names`` if given, else by the plan's
    variable names) and a ``v`` value column."""
    scalars = scalars or {}
    parts: list[DataFrame] = []
    for atom in sp.atoms:
        parts.append(_atom_df(rels, atom))
    for sub in sp.subs:
        sdf = run_sp(sub.sp, rels, scalars)
        parts.append(sdf.withColumnRenamed("v", _san(sub.val)))
    if not parts:
        raise ValueError("sum-product plan with no atoms")

    out = parts[0]
    for df in parts[1:]:
        common = sorted(set(out.columns) & set(df.columns))
        out = out.join(df, on=common) if common else out.crossJoin(df)

    prod = F.lit(1.0)
    for f in sp.factors:
        if f[0] == "const":
            prod = prod * F.lit(float(f[1]))
        elif f[0] == "scalar":
            prod = prod * F.lit(float(scalars[f[1]]))
        else:
            prod = prod * F.col(_san(f[1]))

    keys = [_san(k) for k in sp.out_keys]
    if keys:
        out = out.groupBy(*keys).agg(F.sum(prod).alias("v"))
    else:
        out = out.agg(F.sum(prod).alias("v"))
    if out_names:
        for k, n in zip(keys, out_names):
            out = out.withColumnRenamed(k, n)
    return out


def run_kernel_spark(
    kernel,
    tp_plan,
    coos: dict[str, COO],
    spark: SparkSession,
    scalars: dict[str, float] | None = None,
) -> DataFrame:
    """Convenience: recognize ``tp_plan`` (an optimized logical plan) and
    run it over the given COO tensors."""
    from repro.core.sumproduct import to_sumproduct

    sp = to_sumproduct(
        tp_plan,
        {n: r for n, r in kernel.tensors},
        set(kernel.scalars),
    )
    rels = {n: coo_to_df(spark, coos[n]) for n, _ in kernel.tensors}
    return run_sp(sp, rels, scalars, kernel.out_names)
