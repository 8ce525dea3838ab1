"""Sound implication checking over comparison atoms.

``implies(hyps, concls)`` decides whether the conjunction of the
hypothesis atoms entails every conclusion atom. Both sides are
``repro.algebra.expr`` trees; variables are ``Col`` nodes.

Procedure (each step only *weakens* the hypothesis or *strengthens*
the requirements, so a True answer is sound):

1. flatten ``And``; drop ``Or``/``Not`` hypotheses (weakening);
2. congruence closure over ``Col = Col`` atoms (union-find);
3. record definitions ``col = expr`` (e.g. from expr(Q): revenue =
   price * (1 - disc)) and expand them, with constant folding;
4. per-variable interval bounds from ``col op literal`` atoms;
5. an order graph from ``col op col`` atoms (edges carry strictness),
   with bound propagation along its edges;
6. a conclusion holds if it is syntactically entailed, decided by the
   bounds, decided by reachability in the order graph, an arithmetic
   tautology after linearization, or (for nonlinear terms such as
   ``a * b >= 0``) provable by interval arithmetic.
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Iterable, Optional

from repro.algebra.expr import And, BinOp, Cmp, Col, Expr, Lit, Not, Or

_NEG_INF = ("-inf",)
_POS_INF = ("+inf",)


def _is_num(v) -> bool:
    return isinstance(v, (int, float)) and not isinstance(v, bool)


def _cmp_vals(a, b) -> Optional[int]:
    """-1/0/1 if comparable, else None (mixed types)."""
    if a is _NEG_INF or b is _POS_INF:
        return 0 if (a is _NEG_INF and b is _NEG_INF) else -1
    if a is _POS_INF or b is _NEG_INF:
        return 0 if (a is _POS_INF and b is _POS_INF) else 1
    try:
        if _is_num(a) and _is_num(b):
            return (a > b) - (a < b)
        if isinstance(a, str) and isinstance(b, str):
            return (a > b) - (a < b)
        if type(a) is type(b):
            return (a > b) - (a < b)
    except TypeError:
        return None
    return None


@dataclass
class _Bound:
    lo: object = _NEG_INF
    lo_strict: bool = False
    hi: object = _POS_INF
    hi_strict: bool = False

    def tighten_lo(self, v, strict: bool) -> None:
        c = _cmp_vals(v, self.lo)
        if c is None:
            return
        if c > 0 or (c == 0 and strict and not self.lo_strict):
            self.lo, self.lo_strict = v, strict

    def tighten_hi(self, v, strict: bool) -> None:
        c = _cmp_vals(v, self.hi)
        if c is None:
            return
        if c < 0 or (c == 0 and strict and not self.hi_strict):
            self.hi, self.hi_strict = v, strict


class _UF:
    def __init__(self):
        self.parent: dict[str, str] = {}

    def find(self, x: str) -> str:
        self.parent.setdefault(x, x)
        while self.parent[x] != x:
            self.parent[x] = self.parent[self.parent[x]]
            x = self.parent[x]
        return x

    def union(self, a: str, b: str) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.parent[max(ra, rb)] = min(ra, rb)


def _flatten(exprs: Iterable[Expr]) -> list[Expr]:
    out: list[Expr] = []
    for e in exprs:
        if isinstance(e, And):
            out.extend(_flatten(e.terms))
        else:
            out.append(e)
    return out


def _fold(e: Expr) -> Expr:
    """Constant folding."""
    if isinstance(e, BinOp):
        l, r = _fold(e.left), _fold(e.right)
        if isinstance(l, Lit) and isinstance(r, Lit) and _is_num(l.value) and _is_num(r.value):
            try:
                v = {
                    "+": l.value + r.value,
                    "-": l.value - r.value,
                    "*": l.value * r.value,
                    "/": l.value / r.value,
                }[e.op]
                return Lit(v)
            except ZeroDivisionError:
                pass
        return BinOp(e.op, l, r)
    return e


class _Context:
    """Hypothesis closure: union-find, definitions, bounds, order graph."""

    def __init__(self, hyps: Iterable[Expr]):
        atoms = [a for a in _flatten(hyps) if isinstance(a, Cmp)]
        self.uf = _UF()
        for a in atoms:
            if a.op == "=" and isinstance(a.left, Col) and isinstance(a.right, Col):
                self.uf.union(a.left.name, a.right.name)
        # definitions col = expr (first definition wins)
        self.defs: dict[str, Expr] = {}
        for a in atoms:
            if a.op != "=":
                continue
            for col_side, other in ((a.left, a.right), (a.right, a.left)):
                if isinstance(col_side, Col) and isinstance(other, BinOp):
                    rep = self.uf.find(col_side.name)
                    self.defs.setdefault(rep, other)
        self.atoms = [self._norm_cmp(a) for a in atoms]
        self.atoms = [a for a in self.atoms if a is not None]
        # bounds from col-lit atoms; order edges from col-col atoms
        self.bounds: dict[str, _Bound] = {}
        self.edges: list[tuple[str, str, bool]] = []  # (a, b, strict): a <= b / a < b
        for a in self.atoms:
            self._ingest(a)
        self._propagate()

    # normalization ---------------------------------------------------
    def _expand(self, e: Expr, depth: int = 0) -> Expr:
        if depth > 8:
            return e
        if isinstance(e, Col):
            rep = self.uf.find(e.name)
            if rep in self.defs:
                return self._expand(self.defs[rep], depth + 1)
            return Col(rep)
        if isinstance(e, BinOp):
            return BinOp(
                e.op, self._expand(e.left, depth + 1), self._expand(e.right, depth + 1)
            )
        return e

    def _norm_cmp(self, a: Cmp) -> Optional[Cmp]:
        l = _fold(self._expand(a.left))
        r = _fold(self._expand(a.right))
        op = a.op
        if op in (">", ">="):
            l, r = r, l
            op = "<" if op == ">" else "<="
        return Cmp(op, l, r)

    def _ingest(self, a: Cmp) -> None:
        l, r = a.left, a.right
        if isinstance(l, Col) and isinstance(r, Lit):
            b = self.bounds.setdefault(l.name, _Bound())
            if a.op == "<":
                b.tighten_hi(r.value, True)
            elif a.op == "<=":
                b.tighten_hi(r.value, False)
            elif a.op == "=":
                b.tighten_hi(r.value, False)
                b.tighten_lo(r.value, False)
        elif isinstance(l, Lit) and isinstance(r, Col):
            b = self.bounds.setdefault(r.name, _Bound())
            if a.op == "<":
                b.tighten_lo(l.value, True)
            elif a.op == "<=":
                b.tighten_lo(l.value, False)
            elif a.op == "=":
                b.tighten_hi(l.value, False)
                b.tighten_lo(l.value, False)
        elif isinstance(l, Col) and isinstance(r, Col):
            if a.op == "<":
                self.edges.append((l.name, r.name, True))
            elif a.op == "<=":
                self.edges.append((l.name, r.name, False))
            elif a.op == "=":
                self.edges.append((l.name, r.name, False))
                self.edges.append((r.name, l.name, False))

    def _propagate(self) -> None:
        """Push bounds along <=/< edges to a fixpoint (bounded loop)."""
        names = set(self.bounds)
        for a, b, _ in self.edges:
            names.update((a, b))
        for n in names:
            self.bounds.setdefault(n, _Bound())
        for _ in range(max(1, len(names))):
            changed = False
            for a, b, strict in self.edges:
                ba, bb = self.bounds[a], self.bounds[b]
                before = (bb.lo, bb.lo_strict, ba.hi, ba.hi_strict)
                bb.tighten_lo(ba.lo, ba.lo_strict or strict)
                ba.tighten_hi(bb.hi, bb.hi_strict or strict)
                if (bb.lo, bb.lo_strict, ba.hi, ba.hi_strict) != before:
                    changed = True
            if not changed:
                break

    # queries ---------------------------------------------------------
    def _reach_le(self, a: str, b: str, need_strict: bool) -> bool:
        """Is there a <=-path a ~> b (with a strict edge if needed)?"""
        if a == b:
            return not need_strict
        # BFS over (node, seen_strict)
        from collections import deque

        seen = set()
        dq = deque([(a, False)])
        while dq:
            n, s = dq.popleft()
            if (n, s) in seen:
                continue
            seen.add((n, s))
            for u, v, strict in self.edges:
                if u != n:
                    continue
                s2 = s or strict
                if v == b and (s2 or not need_strict):
                    return True
                dq.append((v, s2))
        return False

    def _ival(self, e: Expr) -> tuple:
        """Interval of ``e`` under the bounds ((lo, lo_strict), (hi, hi_strict));
        numeric only — non-numeric endpoints collapse to infinity."""

        def numify(v, default):
            return v if _is_num(v) else default

        if isinstance(e, Lit):
            if _is_num(e.value):
                return (e.value, False, e.value, False)
            return (-math.inf, True, math.inf, True)
        if isinstance(e, Col):
            b = self.bounds.get(e.name, _Bound())
            lo = numify(b.lo, -math.inf) if b.lo is not _NEG_INF else -math.inf
            hi = numify(b.hi, math.inf) if b.hi is not _POS_INF else math.inf
            return (lo, b.lo_strict, hi, b.hi_strict)
        if isinstance(e, BinOp):
            l = self._ival(e.left)
            r = self._ival(e.right)
            llo, lls, lhi, lhs = l
            rlo, rls, rhi, rhs = r
            if e.op == "+":
                return (llo + rlo, lls or rls, lhi + rhi, lhs or rhs)
            if e.op == "-":
                return (llo - rhi, lls or rhs, lhi - rlo, lhs or rls)
            if e.op == "*":
                cands = []
                for x, xs in ((llo, lls), (lhi, lhs)):
                    for y, ys in ((rlo, rls), (rhi, rhs)):
                        if math.isinf(x) and y == 0 or math.isinf(y) and x == 0:
                            v = 0.0
                        else:
                            v = x * y
                        cands.append((v, xs or ys))
                lo = min(c[0] for c in cands)
                hi = max(c[0] for c in cands)
                los = any(s for v, s in cands if v == lo)
                his = any(s for v, s in cands if v == hi)
                return (lo, los, hi, his)
            if e.op == "/":
                if rlo == rhi and rlo not in (0, 0.0) and not rls and not rhs:
                    d = rlo
                    a1, b1 = llo / d, lhi / d
                    if d > 0:
                        return (a1, lls, b1, lhs)
                    return (b1, lhs, a1, lls)
                return (-math.inf, True, math.inf, True)
        return (-math.inf, True, math.inf, True)

    def _lin(self, e: Expr) -> Optional[tuple[dict[str, float], float]]:
        return linearize(e)

    def _check_var_lit(self, var: str, op: str, value) -> bool:
        """Directly decide ``var op value`` from the derived bounds."""
        b = self.bounds.get(var, _Bound())
        ch = _cmp_vals(b.hi, value)
        cl = _cmp_vals(b.lo, value)
        if op == "<":
            return ch is not None and (ch < 0 or (ch == 0 and b.hi_strict))
        if op == "<=":
            return ch is not None and ch <= 0
        if op == ">":
            return cl is not None and (cl > 0 or (cl == 0 and b.lo_strict))
        if op == ">=":
            return cl is not None and cl >= 0
        if op == "=":
            return (
                ch is not None and cl is not None and ch == 0 == cl
                and not b.hi_strict and not b.lo_strict
            )
        if op == "<>":
            return (
                ch is not None and (ch < 0 or (ch == 0 and b.hi_strict))
            ) or (cl is not None and (cl > 0 or (cl == 0 and b.lo_strict)))
        return False

    def entails(self, concl: Expr) -> bool:
        if isinstance(concl, And):
            return all(self.entails(t) for t in concl.terms)
        if isinstance(concl, Or):
            return any(self.entails(t) for t in concl.terms)
        if isinstance(concl, Lit):
            return concl.value is True
        if isinstance(concl, Not):
            return False  # out of fragment
        if not isinstance(concl, Cmp):
            return False
        a = self._norm_cmp(concl)
        l, r = a.left, a.right
        # reflexivity after expansion (covers nonlinear expr = expr)
        if a.op in ("=", "<=") and l.to_sql() == r.to_sql():
            return True
        # constant decision
        if isinstance(l, Lit) and isinstance(r, Lit):
            c = _cmp_vals(l.value, r.value)
            if c is None:
                return False
            return {"<": c < 0, "<=": c <= 0, "=": c == 0, "<>": c != 0}[a.op]
        # syntactic entailment against a hypothesis atom
        for h in self.atoms:
            if h.op == a.op and h.left.to_sql() == l.to_sql() and h.right.to_sql() == r.to_sql():
                return True
            if (
                a.op in ("=", "<>")
                and h.op == a.op
                and h.left.to_sql() == r.to_sql()
                and h.right.to_sql() == l.to_sql()
            ):
                return True
            # a <= entailed by a hypothesis < or =
            if a.op == "<=" and h.op in ("<", "=") and h.left.to_sql() == l.to_sql() and h.right.to_sql() == r.to_sql():
                return True
            if a.op == "<=" and h.op == "=" and h.left.to_sql() == r.to_sql() and h.right.to_sql() == l.to_sql():
                return True
        if isinstance(l, Col) and isinstance(r, Col):
            if a.op == "=":
                return l.name == r.name or (
                    self._reach_le(l.name, r.name, False)
                    and self._reach_le(r.name, l.name, False)
                )
            if a.op in ("<", "<="):
                if self._reach_le(l.name, r.name, a.op == "<"):
                    return True
        if isinstance(l, Col) and isinstance(r, Lit):
            if self._check_var_lit(l.name, a.op, r.value):
                return True
        if isinstance(l, Lit) and isinstance(r, Col):
            flipped = {"<": ">", "<=": ">=", "=": "=", "<>": "<>"}[a.op]
            if self._check_var_lit(r.name, flipped, l.value):
                return True
        # arithmetic tautology via linearization: l - r op 0
        diff = BinOp("-", l, r)
        lin = self._lin(diff)
        if lin is not None:
            coeffs, const = lin
            if not coeffs:
                return {"<": const < 0, "<=": const <= 0, "=": const == 0, "<>": const != 0}[a.op]
            if len(coeffs) == 1:
                ((var, coef),) = coeffs.items()
                # coef*var + const op 0  ->  var op' (-const/coef)
                thr = -const / coef
                op = a.op
                if coef < 0 and op in ("<", "<="):
                    op = {"<": ">", "<=": ">="}[op]
                if op in ("<", "<=", ">", ">=", "=", "<>") and self._check_var_lit(
                    var, op, thr
                ):
                    return True
        # interval arithmetic for (non)linear inequalities
        lo, los, hi, his = self._ival(diff)
        if a.op == "<" and (hi < 0 or (hi == 0 and his)):
            return True
        if a.op == "<=" and hi <= 0:
            return True
        if a.op == "<>" and ((hi < 0 or (hi == 0 and his)) or (lo > 0 or (lo == 0 and los))):
            return True
        return False


def linearize(e: Expr) -> Optional[tuple[dict[str, float], float]]:
    """Linearize an arithmetic expression into (coeffs, const);
    None if nonlinear (variable * variable, division by variable)."""
    if isinstance(e, Lit):
        return ({}, float(e.value)) if _is_num(e.value) else None
    if isinstance(e, Col):
        return ({e.name: 1.0}, 0.0)
    if isinstance(e, BinOp):
        l = linearize(e.left)
        r = linearize(e.right)
        if l is None or r is None:
            return None
        lc, lk = l
        rc, rk = r
        if e.op == "+":
            out = dict(lc)
            for k, v in rc.items():
                out[k] = out.get(k, 0.0) + v
            return ({k: v for k, v in out.items() if v != 0}, lk + rk)
        if e.op == "-":
            out = dict(lc)
            for k, v in rc.items():
                out[k] = out.get(k, 0.0) - v
            return ({k: v for k, v in out.items() if v != 0}, lk - rk)
        if e.op == "*":
            if not lc:
                return ({k: v * lk for k, v in rc.items()}, lk * rk)
            if not rc:
                return ({k: v * rk for k, v in lc.items()}, lk * rk)
            return None
        if e.op == "/":
            if not rc and rk not in (0, 0.0):
                return ({k: v / rk for k, v in lc.items()}, lk / rk)
            return None
    return None


def implies(hyps: Iterable[Expr], concls: Iterable[Expr] | Expr) -> bool:
    """True iff the conjunction of ``hyps`` provably entails every
    conclusion. Sound, not complete (False = "could not prove")."""
    ctx = _Context(hyps)
    if isinstance(concls, Expr):
        concls = [concls]
    return all(ctx.entails(c) for c in _flatten(concls))
