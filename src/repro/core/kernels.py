"""The five tensor programs of the evaluation (paper Table 3), written in
SDQLite exactly as a user would write them, plus the relational (COO) SQL
used by the DuckDB baseline and the oracle.

SQL conventions: tensor T of rank d is a relation ``T(i1..id, v)``; every
kernel's SQL groups by the output indices and sums the product — the
"naive" relational plan the paper attributes to DuckDB (no aggregate
push-down, binary joins).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class Kernel:
    """One tensor program: SDQLite source + oracle SQL + metadata."""

    name: str
    tp_src: str  # SDQLite, referencing logical tensor names
    tensors: tuple  # ((name, rank), ...) in join order
    scalars: tuple = ()  # scalar parameter names
    out_rank: int = 0  # rank of the result
    out_names: tuple = ()  # output index column names (match ``sql``)
    sql: str = ""  # DuckDB SQL over COO relations (also the oracle)


MMM = Kernel(
    name="MMM",
    tp_src="sum(<(i,j),a> in A, <(j,k),b> in B) { (i,k) -> a*b }",
    tensors=(("A", 2), ("B", 2)),
    out_rank=2,
    out_names=("i", "k"),
    sql="""
      SELECT A.i1 AS i, B.i2 AS k, SUM(A.v * B.v) AS v
      FROM A JOIN B ON A.i2 = B.i1
      GROUP BY A.i1, B.i2
    """,
)

SUM_MMM = Kernel(
    name="SumMMM",
    tp_src="sum(<(i,j),a> in A, <(j,k),b> in B) a*b",
    tensors=(("A", 2), ("B", 2)),
    out_rank=0,
    sql="""
      SELECT SUM(A.v * B.v) AS v
      FROM A JOIN B ON A.i2 = B.i1
    """,
)

BATAX = Kernel(
    name="BATAX",
    tp_src=(
        "sum(<(i,j),Aij> in A, <(i,k),Aik> in A)"
        " { j -> beta * Aij * Aik * x(k) }"
    ),
    tensors=(("A", 2), ("x", 1)),
    scalars=("beta",),
    out_rank=1,
    out_names=("j",),
    sql="""
      SELECT A1.i2 AS j, SUM(b.v * A1.v * A2.v * x.v) AS v
      FROM A A1
      JOIN A A2 ON A1.i1 = A2.i1
      JOIN x ON x.i1 = A2.i2
      CROSS JOIN beta b
      GROUP BY A1.i2
    """,
)

TTM = Kernel(
    name="TTM",
    tp_src=(
        "sum(<(i,j,l),av> in A, <(k,l),bv> in B) { (i,j,k) -> av*bv }"
    ),
    tensors=(("A", 3), ("B", 2)),
    out_rank=3,
    out_names=("i", "j", "k"),
    sql="""
      SELECT A.i1 AS i, A.i2 AS j, B.i1 AS k, SUM(A.v * B.v) AS v
      FROM A JOIN B ON A.i3 = B.i2
      GROUP BY A.i1, A.i2, B.i1
    """,
)

MTTKRP = Kernel(
    name="MTTKRP",
    tp_src=(
        "sum(<(i,k,l),bv> in B, <(k,j),cv> in C, <(l,j),dv> in D)"
        " { (i,j) -> bv*cv*dv }"
    ),
    tensors=(("B", 3), ("C", 2), ("D", 2)),
    out_rank=2,
    out_names=("i", "j"),
    sql="""
      SELECT B.i1 AS i, C.i2 AS j, SUM(B.v * C.v * D.v) AS v
      FROM B
      JOIN C ON B.i2 = C.i1
      JOIN D ON B.i3 = D.i1 AND C.i2 = D.i2
      GROUP BY B.i1, C.i2
    """,
)

KERNELS: dict[str, Kernel] = {
    k.name: k for k in (MMM, SUM_MMM, BATAX, TTM, MTTKRP)
}
