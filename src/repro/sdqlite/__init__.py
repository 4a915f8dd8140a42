"""SDQLite: the paper's declarative tensor calculus (Sec. 3.2).

Submodules:
  ast    -- immutable, hashable expression nodes + free-variable analysis
  interp -- reference interpreter (logical semiring-dictionary semantics)
  parser -- recursive-descent parser for the paper's concrete syntax
"""
from repro.sdqlite.ast import (  # noqa: F401
    Add, Const, Dict, Eq, Expr, Get, If, Leq, Let, Lt, Merge, Mul, Neg,
    Prim, Range, Sub, SubArr, Sum, Var, free_vars, fresh_name,
)
from repro.sdqlite.interp import canon, interp  # noqa: F401
from repro.sdqlite.parser import parse  # noqa: F401
