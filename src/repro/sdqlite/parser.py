"""Parser for SDQLite's concrete syntax (paper Sec. 3.2 + Table 1 sugar).

Grammar (informal)::

    expr    := sum | let | if | cmp
    sum     := 'sum' '(' iter (',' iter)* ')' expr
    iter    := '<' pat ',' pat '>' 'in' expr
    pat     := NAME | '_' | '(' pat (',' pat)* ')'
    let     := 'let' NAME '=' expr (',' NAME '=' expr)* 'in' expr
    if      := 'if' '(' expr ')' 'then' expr
    cmp     := range (('=='|'<'|'<=') range)?
    range   := add (':' add)?
    add     := mul (('+'|'-') mul)*
    mul     := unary ('*' unary)*
    unary   := '-' unary | postfix
    postfix := primary ( '(' expr (':' expr | (',' expr)*) ')' )*
    primary := NUMBER | NAME | dict | '(' expr ')'
    dict    := '{' entry (',' entry)* '}'
    entry   := ('@unique'|'@dense'|'@hash')* keyexpr '->' expr
    keyexpr := '(' expr (',' expr)* ')' | expr     -- tuple keys curry

Desugaring implemented here (Table 1):
  * tuple keys in dicts curry to nested dicts;
  * tuple patterns in ``sum`` uncurry to nested sums;
  * multiple iterators become nested sums;
  * a key variable repeated across iterators becomes an equality filter
    ``if (k1 == k2) then ...``;
  * multi-binding ``let`` nests.

Every binder mints a globally fresh name (see ``ast.fresh_name``); user
names are resolved through a lexical scope, and unresolved names are kept
verbatim as globals (physical arrays / tensor names).
"""
from __future__ import annotations

import re

from repro.sdqlite.ast import (
    Add, Const, Dict, Eq, Expr, Get, If, Leq, Let, Lt, Mul, Neg, Prim,
    Range, Sub, SubArr, Sum, Var, fresh_name,
)
from repro.sdqlite.interp import PRIMITIVES

_TOKEN = re.compile(
    r"\s*(?:(?P<num>\d+\.\d+|\d+)|(?P<name>[A-Za-z_][A-Za-z_0-9]*)"
    r"|(?P<ann>@[a-z]+)"
    r"|(?P<op>==|<=|->|[-+*/%(){}<>,:=])|(?P<bad>\S))"
)
_KEYWORDS = {"sum", "let", "in", "if", "then"}


def _tokenize(src: str) -> list[tuple[str, str]]:
    toks = []
    for m in _TOKEN.finditer(src):
        if m.group("bad"):
            raise SyntaxError(f"unexpected character {m.group('bad')!r}")
        if m.group("num"):
            toks.append(("num", m.group("num")))
        elif m.group("name"):
            g = m.group("name")
            toks.append(("kw" if g in _KEYWORDS else "name", g))
        elif m.group("ann"):
            toks.append(("ann", m.group("ann")))
        else:
            toks.append(("op", m.group("op")))
    toks.append(("eof", ""))
    return toks


class _Parser:
    def __init__(self, src: str):
        self.toks = _tokenize(src)
        self.pos = 0

    # -- token helpers ----------------------------------------------------
    def peek(self) -> tuple[str, str]:
        return self.toks[self.pos]

    def next(self) -> tuple[str, str]:
        t = self.toks[self.pos]
        self.pos += 1
        return t

    def accept(self, kind: str, text: str | None = None) -> bool:
        k, v = self.peek()
        if k == kind and (text is None or v == text):
            self.pos += 1
            return True
        return False

    def expect(self, kind: str, text: str | None = None) -> str:
        k, v = self.next()
        if k != kind or (text is not None and v != text):
            raise SyntaxError(f"expected {text or kind}, got {v!r}")
        return v

    # -- grammar ----------------------------------------------------------
    def expr(self, scope: dict[str, str]) -> Expr:
        k, v = self.peek()
        if (k, v) == ("kw", "sum"):
            return self.sum_expr(scope)
        if (k, v) == ("kw", "let"):
            return self.let_expr(scope)
        if (k, v) == ("kw", "if"):
            return self.if_expr(scope)
        return self.cmp(scope)

    def sum_expr(self, scope: dict[str, str]) -> Expr:
        self.expect("kw", "sum")
        self.expect("op", "(")
        iters = []  # (key_pats, val_pat, source_expr)
        while True:
            self.expect("op", "<")
            kpat = self.pattern()
            self.expect("op", ",")
            vpat = self.pattern()
            if isinstance(vpat, list):
                raise SyntaxError("value pattern must be a single name")
            self.expect("op", ">")
            self.expect("kw", "in")
            src = self.expr(scope)
            iters.append((kpat, vpat, src))
            if not self.accept("op", ","):
                break
        self.expect("op", ")")

        # Desugar to nested sums. ``seen`` maps user key-names already bound
        # in *this* sum group to their fresh names, so a repeated key name
        # becomes an equality filter (Table 1, last row).
        scope = dict(scope)
        seen: dict[str, str] = {}
        binders: list[tuple[str, str, Expr]] = []  # (kfresh, vfresh, src)
        conds: list[Expr] = []

        def bind_key(user: str) -> str:
            if user == "_":
                return fresh_name("_")
            if user in seen:
                f = fresh_name(user)
                conds.append(Eq(Var(f), Var(seen[user])))
                return f
            f = fresh_name(user)
            seen[user] = f
            scope[user] = f
            return f

        for kpat, vpat, src in iters:
            names = kpat if isinstance(kpat, list) else [kpat]
            # Tuple key <(k1,..,kd), v> uncurries: iterate nested dicts.
            cur_src = src
            for i, kn in enumerate(names):
                kf = bind_key(kn)
                last = i == len(names) - 1
                if last:
                    if vpat == "_":
                        vf = fresh_name("_")
                    else:
                        vf = fresh_name(vpat)
                        scope[vpat] = vf
                else:
                    vf = fresh_name("w")
                binders.append((kf, vf, cur_src))
                cur_src = Var(vf)

        body = self.expr(scope)
        for c in reversed(conds):
            body = If(c, body)
        for kf, vf, src in reversed(binders):
            body = Sum(kf, vf, src, body)
        return body

    def pattern(self):
        if self.accept("op", "("):
            names = [self.expect("name")]
            while self.accept("op", ","):
                names.append(self.expect("name"))
            self.expect("op", ")")
            return names
        return self.expect("name")

    def let_expr(self, scope: dict[str, str]) -> Expr:
        self.expect("kw", "let")
        scope = dict(scope)
        bindings = []
        while True:
            user = self.expect("name")
            self.expect("op", "=")
            bound = self.expr(scope)
            f = fresh_name(user)
            scope[user] = f  # later bindings see earlier ones
            bindings.append((f, bound))
            if not self.accept("op", ","):
                break
        self.expect("kw", "in")
        body = self.expr(scope)
        for f, bound in reversed(bindings):
            body = Let(f, bound, body)
        return body

    def if_expr(self, scope: dict[str, str]) -> Expr:
        self.expect("kw", "if")
        self.expect("op", "(")
        cond = self.expr(scope)
        self.expect("op", ")")
        self.expect("kw", "then")
        return If(cond, self.expr(scope))

    def cmp(self, scope) -> Expr:
        a = self.range_expr(scope)
        if self.accept("op", "=="):
            return Eq(a, self.range_expr(scope))
        if self.accept("op", "<="):
            return Leq(a, self.range_expr(scope))
        if self.accept("op", "<"):
            return Lt(a, self.range_expr(scope))
        return a

    def range_expr(self, scope) -> Expr:
        a = self.add(scope)
        if self.accept("op", ":"):
            return Range(a, self.add(scope))
        return a

    def add(self, scope) -> Expr:
        a = self.mul(scope)
        while True:
            if self.accept("op", "+"):
                b = self.mul(scope)
                # An 'if' to the right of '+' (band-matrix idiom) binds
                # greedily: {..} + if (c) then {..}
                a = Add(a, b)
            elif self.accept("op", "-"):
                a = Sub(a, self.mul(scope))
            else:
                return a

    def mul(self, scope) -> Expr:
        a = self.unary(scope)
        while True:
            if self.accept("op", "*"):
                a = Mul(a, self.unary(scope))
            elif self.accept("op", "/"):
                a = Prim("div", (a, self.unary(scope)))
            elif self.accept("op", "%"):
                a = Prim("mod", (a, self.unary(scope)))
            else:
                return a

    def unary(self, scope) -> Expr:
        if self.accept("op", "-"):
            return Neg(self.unary(scope))
        k, v = self.peek()
        if (k, v) == ("kw", "if"):
            return self.if_expr(scope)
        if k == "kw" and v in ("sum", "let"):
            return self.expr(scope)
        return self.postfix(scope)

    def postfix(self, scope) -> Expr:
        e = self.primary(scope)
        while self.accept("op", "("):
            first = self.expr(scope)
            # e(lo:hi) — the range already parsed at the range_expr level.
            if isinstance(first, Range) and self.accept("op", ")"):
                e = SubArr(e, first.lo, first.hi)
                continue
            if self.accept("op", ":"):
                hi = self.expr(scope)
                self.expect("op", ")")
                e = SubArr(e, first, hi)
                continue
            args = [first]
            while self.accept("op", ","):
                args.append(self.expr(scope))
            self.expect("op", ")")
            if isinstance(e, Var) and e.name in PRIMITIVES:
                e = Prim(e.name, tuple(args))
            else:
                for a in args:  # curried multi-dim lookup A(i,j) = A(i)(j)
                    e = Get(e, a)
        return e

    def primary(self, scope) -> Expr:
        k, v = self.peek()
        if k == "num":
            self.next()
            return Const(float(v) if "." in v else int(v))
        if k == "name":
            self.next()
            return Var(scope.get(v, v))
        if self.accept("op", "("):
            e = self.expr(scope)
            if self.accept("op", ","):
                raise SyntaxError("tuple expressions only appear in dict keys")
            self.expect("op", ")")
            return e
        if self.accept("op", "{"):
            return self.dict_expr(scope)
        raise SyntaxError(f"unexpected token {v!r}")

    def dict_expr(self, scope) -> Expr:
        if self.accept("op", "}"):  # {} is the empty dictionary == 0
            return Const(0)
        entries = []
        while True:
            unique = phys = None
            while self.peek()[0] == "ann":
                ann = self.next()[1]
                if ann == "@unique":
                    unique = True
                elif ann in ("@dense", "@hash"):
                    phys = ann[1:]
                else:
                    raise SyntaxError(f"unknown annotation {ann}")
            keys = self.key_tuple(scope)
            self.expect("op", "->")
            val = self.expr(scope)
            # Curry tuple keys: {(a,b) -> v} == {a -> {b -> v}}; the
            # annotations apply to every level.
            for kx in reversed(keys):
                val = Dict(kx, val, bool(unique), phys)
            entries.append(val)
            if not self.accept("op", ","):
                break
        self.expect("op", "}")
        out = entries[0]
        for e in entries[1:]:
            out = Add(out, e)
        return out

    def key_tuple(self, scope) -> list[Expr]:
        # A dict key: either "( e1, e2, ... )" (a tuple) or a plain expr.
        # "(e)" with no comma is grouping, not a tuple; "()" is the empty
        # tuple — a 0-dim dict identified with its scalar value (Sec. 2).
        if self.peek() == ("op", "("):
            save = self.pos
            self.next()
            if self.accept("op", ")"):
                return []
            first = self.expr(scope)
            if self.accept("op", ","):
                keys = [first, self.expr(scope)]
                while self.accept("op", ","):
                    keys.append(self.expr(scope))
                self.expect("op", ")")
                return keys
            self.pos = save  # plain parenthesized expr; reparse normally
        return [self.range_expr(scope)]


def parse(src: str, scope: dict[str, str] | None = None) -> Expr:
    """Parse an SDQLite source string into an AST.

    ``scope`` optionally pre-binds user names to existing fresh names (used
    when composing a tensor program with storage mappings).
    """
    p = _Parser(src)
    e = p.expr(dict(scope or {}))
    if p.peek()[0] != "eof":
        raise SyntaxError(f"trailing input at token {p.peek()[1]!r}")
    return e
