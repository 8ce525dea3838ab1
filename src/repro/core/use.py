"""Using provenance sketches: the Q[P] rewrite (paper Sec. 8).

A sketch decodes to a disjunction of range predicates on the sketched
attribute (Eq. 2); ``apply_sketches`` adds a selection with that
predicate above every covered table access. Adjacent fragments are
coalesced into one range first (Sec. 8.1), so a sketch of k fragments
with r maximal runs yields only r disjuncts.

Spark's Catalyst then pushes these filters into the scan; when the
base table is Parquet clustered on the sketched attribute, row-group
min/max pruning skips the data exactly like the paper's zone maps /
BRIN indexes (see ``repro.physical``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping, Optional

import numpy as np
import pandas as pd

from repro.algebra.expr import And, Col, Expr, Lit, Or
from repro.algebra.ops import Op, Select, TableAccess, replace_tables
from repro.core.sketch import ProvenanceSketch


def range_condition(attr: str, lo, hi) -> Optional[Expr]:
    """Condition for one merged (lo, hi] range; None = unrestricted."""
    c = Col(attr)
    if lo is None and hi is None:
        return None
    if lo is None:
        return c.le(Lit(hi))
    if hi is None:
        return c.gt(Lit(lo))
    return And(c.gt(Lit(lo)), c.le(Lit(hi)))


@dataclass(frozen=True)
class RangeMembership(Expr):
    """Binary-search membership test over merged sketch ranges — the
    paper's Sec. 8.1 optimization that replaces an O(k)-disjunct OR
    with an O(log k) lookup. ``ranges`` is the sorted tuple of merged
    (lo_exclusive, hi_inclusive) pairs (None = unbounded side).

    Compiles to a vectorized ``np.searchsorted`` pandas UDF on Spark
    (so it cannot be pushed into the scan — ``sketch_predicate``
    therefore pairs it with a coarse, pushdown-friendly disjunction)
    and renders as the full OR disjunction in SQL for the oracle.
    """

    attr: Expr
    ranges: tuple  # sorted ((lo, hi), ...) pairs

    def children(self):
        return (self.attr,)

    def _or_expr(self) -> Expr:
        conds = [range_condition_expr(self.attr, lo, hi) for lo, hi in self.ranges]
        return conds[0] if len(conds) == 1 else Or(*conds)

    def to_sql(self) -> str:
        return self._or_expr().to_sql()

    def _membership(self, values: np.ndarray) -> np.ndarray:
        if len(values) == 0:
            return np.zeros(0, dtype=bool)
        try:
            # numeric fast path: fully vectorized O(n log k)
            v = values.astype(np.float64)
            lows = np.array(
                [-np.inf if lo is None else float(lo) for lo, _ in self.ranges]
            )
            his = np.array(
                [np.inf if hi is None else float(hi) for _, hi in self.ranges]
            )
            idx = np.clip(
                np.searchsorted(his, v, side="left"), 0, len(self.ranges) - 1
            )
            return (v <= his[idx]) & (v > lows[idx])
        except (TypeError, ValueError):
            # generic (e.g. string) path: per-value bisection
            import bisect

            finite_his = [hi for _, hi in self.ranges if hi is not None]
            open_high = self.ranges[-1][1] is None
            out = np.zeros(len(values), dtype=bool)
            for i, val in enumerate(values):
                j = bisect.bisect_left(finite_his, val)
                if j >= len(finite_his):
                    if not open_high:
                        continue
                    j = len(self.ranges) - 1
                lo, hi = self.ranges[j]
                out[i] = (lo is None or val > lo) and (hi is None or val <= hi)
            return out

    def to_spark(self):
        from pyspark.sql.functions import pandas_udf

        node = self

        @pandas_udf("boolean")
        def _member(s: pd.Series) -> pd.Series:
            return pd.Series(node._membership(s.to_numpy()), index=s.index)

        return _member(self.attr.to_spark())

    def eval_pandas(self, df):
        vals = self.attr.eval_pandas(df)
        return pd.Series(self._membership(vals.to_numpy()), index=vals.index)

    def columns(self):
        return self.attr.columns()

    def bind(self, bindings):
        return self


def range_condition_expr(attr: Expr, lo, hi) -> Optional[Expr]:
    if lo is None and hi is None:
        return None
    if lo is None:
        return attr.le(Lit(hi))
    if hi is None:
        return attr.gt(Lit(lo))
    return And(attr.gt(Lit(lo)), attr.le(Lit(hi)))


def coarsen_ranges(ranges, budget: int) -> list:
    """Merge the closest adjacent ranges (bridging their gaps) until at
    most ``budget`` remain. The result covers a superset of the input,
    which is still a *safe* sketch by Lem. 5 — only precision drops."""
    rs = list(ranges)
    if len(rs) <= budget:
        return rs

    def gap(a, b):
        # numeric gap if possible, else 0 (arbitrary merge order)
        lo_b, hi_a = b[0], a[1]
        try:
            return float(lo_b) - float(hi_a)
        except (TypeError, ValueError):
            return 0.0

    while len(rs) > budget:
        gaps = [gap(rs[i], rs[i + 1]) for i in range(len(rs) - 1)]
        i = int(np.argmin(gaps))
        rs[i : i + 2] = [(rs[i][0], rs[i + 1][1])]
    return rs


def sketch_predicate(
    sketch: ProvenanceSketch, *, max_disjuncts: int = 4
) -> Optional[Expr]:
    """The filter predicate for a sketch, or None if the sketch covers
    the whole partition (no restriction — using it would only add
    per-tuple evaluation cost, paper Sec. 9.3 MonetDB discussion).

    Up to ``max_disjuncts`` merged ranges decode to a plain OR of
    range conditions, which Catalyst pushes into the scan. Beyond
    that, a large disjunction costs more than it saves (the paper's
    Sec. 8.1 observation), so the predicate becomes: a *coarsened*
    disjunction (<= max_disjuncts ranges, still pushed down and used
    for zone-map skipping) AND an exact O(log k) binary-search
    membership test (the paper's BS method)."""
    if not sketch.fragments:
        # empty sketch: provenance is empty; nothing qualifies
        return Lit(False)
    ranges = sketch.partition.merged_ranges(sketch.fragments)
    if any(lo is None and hi is None for lo, hi in ranges):
        return None
    conds = [range_condition(sketch.attr, lo, hi) for lo, hi in ranges]
    if len(conds) <= max_disjuncts:
        return conds[0] if len(conds) == 1 else Or(*conds)
    coarse_ranges = coarsen_ranges(ranges, max(1, max_disjuncts))
    coarse = [range_condition(sketch.attr, lo, hi) for lo, hi in coarse_ranges]
    exact = RangeMembership(Col(sketch.attr), tuple(ranges))
    if any(c is None for c in coarse):
        # coarsening collapsed to the whole domain: exact test only
        return exact
    coarse_e = coarse[0] if len(coarse) == 1 else Or(*coarse)
    return And(coarse_e, exact)


def apply_sketches(
    q: Op, sketches: Mapping[str, ProvenanceSketch], *, max_disjuncts: int = 4
) -> Op:
    """Q[P]: identity everywhere except table accesses covered by a
    sketch, which gain the decoded range filter."""
    repl: dict[str, Op] = {}
    for rel, sk in sketches.items():
        pred = sketch_predicate(sk, max_disjuncts=max_disjuncts)
        if pred is None:
            continue
        base = TableAccess(rel, _schema_of(q, rel))
        repl[rel] = Select(base, pred)
    return replace_tables(q, repl)


def _schema_of(q: Op, rel: str) -> tuple[str, ...]:
    """Find the schema the query uses for base relation ``rel``."""
    if isinstance(q, TableAccess):
        if q.name == rel:
            return q.table_schema
        return ()
    for c in q.children():
        s = _schema_of(c, rel)
        if s:
            return s
    return ()
