"""Provenance-sketch capture by query instrumentation (paper Sec. 7).

``instrument(Q, partitions)`` rewrites the logical IR per Fig. 6:

* r0 INIT  — each instrumented relation gets an annotation column
  ``_ps_<rel>`` holding its fragment id, computed per Sec. 7.1 either
  as a CASE chain (``method="case"``) or by binary search over the
  range boundaries (``method="bsearch"``, the Sec. 7.3 optimization).
  Keeping the plain *id* (not a bitvector) until the first aggregation
  is the paper's *delay* optimization.
* r1/r2/r5 — projection/selection/top-k pass annotations through.
* r3       — aggregation merges the group's annotations with BITOR;
  in Spark, ``collect_set`` (ids) / flatten+distinct (sets) of the
  set encoding. A solitary min/max aggregate instead joins the
  aggregation result back on ``f(a) = a AND G = G`` so only the
  witness tuples contribute.
* r4/r6    — join/cross/union instrument both inputs.
* r7 INSTR — a final global BITOR produces one row: the sketch.

``capture_sketch`` runs the instrumented plan on Spark and returns
``ProvenanceSketch`` objects.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.algebra.compile_spark import compile_op
from repro.algebra.expr import Col, Expr, FragmentId
from repro.algebra.ops import (
    Aggregate,
    AggSpec,
    CrossProduct,
    Distinct,
    Join,
    Op,
    Project,
    Select,
    TableAccess,
    TopK,
    Union,
)
from repro.core.ranges import RangePartition
from repro.core.sketch import ProvenanceSketch


def ann_col(relation: str) -> str:
    return f"_ps_{relation}"


@dataclass(frozen=True)
class ToArray(Expr):
    """Wrap a scalar fragment id into a singleton array (kind id->set)."""

    term: Expr

    def children(self):
        return (self.term,)

    def to_sql(self) -> str:
        return f"[{self.term.to_sql()}]"

    def to_spark(self):
        from pyspark.sql import functions as F

        return F.array(self.term.to_spark())

    def eval_pandas(self, df):
        return self.term.eval_pandas(df).map(lambda v: [int(v)])

    def columns(self):
        return self.term.columns()

    def bind(self, bindings):
        return ToArray(self.term.bind(bindings))


@dataclass(frozen=True)
class EmptyIntArray(Expr):
    """An empty annotation — a union branch that does not access the
    instrumented relation contributes no fragments."""

    def to_sql(self) -> str:
        return "CAST([] AS INTEGER[])"

    def to_spark(self):
        from pyspark.sql import functions as F

        return F.array().cast("array<int>")

    def eval_pandas(self, df):
        return pd.Series([[] for _ in range(len(df))], index=df.index)

    def columns(self):
        return frozenset()

    def bind(self, bindings):
        return self


@dataclass
class _Propped:
    """An instrumented subplan: op + the annotation columns it carries.

    ``anns`` maps relation -> (column name, kind) with kind "id" (plain
    int, the delay encoding) or "set" (array<int>).
    """

    op: Op
    anns: dict[str, tuple[str, str]]


def _passthrough_project(p: _Propped, items) -> _Propped:
    full = tuple(items) + tuple(
        (Col(c), c) for c, _ in (p.anns[r] for r in sorted(p.anns))
    )
    return _Propped(Project(p.op, full), p.anns)


def _prop(
    q: Op, partitions: Mapping[str, RangePartition], method: str
) -> _Propped:
    if isinstance(q, TableAccess):
        if q.name not in partitions:
            return _Propped(q, {})
        part = partitions[q.name]
        items = tuple((Col(c), c) for c in q.table_schema) + (
            (
                FragmentId(Col(part.attr), part.boundaries, method),
                ann_col(q.name),
            ),
        )
        return _Propped(
            Project(q, items), {q.name: (ann_col(q.name), "id")}
        )
    if isinstance(q, Select):
        p = _prop(q.child, partitions, method)
        return _Propped(Select(p.op, q.cond), p.anns)
    if isinstance(q, Project):
        p = _prop(q.child, partitions, method)
        return _passthrough_project(p, q.items)
    if isinstance(q, Aggregate):
        return _prop_aggregate(q, partitions, method)
    if isinstance(q, (Join, CrossProduct)):
        l = _prop(q.left, partitions, method)
        r = _prop(q.right, partitions, method)
        joined: Op = (
            Join(l.op, r.op, q.cond)
            if isinstance(q, Join)
            else CrossProduct(l.op, r.op)
        )
        anns = {**l.anns, **r.anns}
        # normalize column order: plain schema first, annotations last
        items = tuple((Col(c), c) for c in q.schema())
        full = items + tuple(
            (Col(c), c) for c, _ in (anns[rel] for rel in sorted(anns))
        )
        return _Propped(Project(joined, full), anns)
    if isinstance(q, Union):
        return _prop_union(q, partitions, method)
    if isinstance(q, Distinct):
        # delta merges duplicates; their annotations are unioned, which
        # is a group-by on all attributes with a BITOR (not in Fig. 6's
        # rule list — the paper's queries have no delta — but required
        # for lineage-correct capture through duplicate removal).
        p = _prop(q.child, partitions, method)
        aggs = tuple(
            AggSpec("sketch", p.anns[rel][0], p.anns[rel][0])
            for rel in sorted(p.anns)
        )
        new_anns = {rel: (c, "set") for rel, (c, _) in p.anns.items()}
        return _Propped(
            Aggregate(p.op, tuple(q.schema()), aggs), new_anns
        )
    if isinstance(q, TopK):
        p = _prop(q.child, partitions, method)
        return _Propped(TopK(p.op, q.order, q.k), p.anns)
    raise TypeError(f"cannot instrument {type(q).__name__}")


def _prop_aggregate(
    q: Aggregate, partitions: Mapping[str, RangePartition], method: str
) -> _Propped:
    p = _prop(q.child, partitions, method)
    if not p.anns:
        return _Propped(q, {})
    only_minmax = len(q.aggs) == 1 and q.aggs[0].func in ("min", "max")
    if only_minmax:
        # r3 witness branch: gamma(Q) |><| PROP(Q) on f(a)=a AND G=G,
        # keeping only annotations of tuples attaining the extremum.
        spec = q.aggs[0]
        agg_plain = Aggregate(q.child, q.group_by, (spec,))
        renamed = Project(
            agg_plain,
            tuple((Col(g), f"{g}__w") for g in q.group_by)
            + ((Col(spec.alias), f"{spec.alias}__w"),),
        )
        cond_terms = [Col(spec.attr).eq(Col(f"{spec.alias}__w"))] + [
            Col(g).eq(Col(f"{g}__w")) for g in q.group_by
        ]
        from repro.algebra.expr import And

        cond = cond_terms[0] if len(cond_terms) == 1 else And(*cond_terms)
        joined = Join(p.op, renamed, cond)
        items = tuple((Col(g), g) for g in q.group_by) + (
            (Col(f"{spec.alias}__w"), spec.alias),
        )
        out = _passthrough_project(_Propped(joined, p.anns), items)
        return out
    aggs = tuple(q.aggs) + tuple(
        AggSpec("sketch", p.anns[rel][0], p.anns[rel][0])
        for rel in sorted(p.anns)
    )
    new_anns = {rel: (c, "set") for rel, (c, _) in p.anns.items()}
    return _Propped(Aggregate(p.op, q.group_by, aggs), new_anns)


def _prop_union(
    q: Union, partitions: Mapping[str, RangePartition], method: str
) -> _Propped:
    l = _prop(q.left, partitions, method)
    r = _prop(q.right, partitions, method)
    rels = sorted(set(l.anns) | set(r.anns))
    # normalize both branches to: plain schema + one array annotation
    # per instrumented relation (missing branch -> empty array).
    def normalize(p: _Propped, schema_names, target_names) -> Op:
        items = [
            (Col(c), out) for c, out in zip(schema_names, target_names)
        ]
        for rel in rels:
            if rel in p.anns:
                c, kind = p.anns[rel]
                e: Expr = Col(c) if kind == "set" else ToArray(Col(c))
            else:
                e = EmptyIntArray()
            items.append((e, ann_col(rel)))
        return Project(p.op, tuple(items))

    lnames = q.left.schema()
    ln = normalize(l, lnames, lnames)
    rn = normalize(r, q.right.schema(), lnames)
    anns = {rel: (ann_col(rel), "set") for rel in rels}
    return _Propped(Union(ln, rn), anns)


def instrument(
    q: Op,
    partitions: Mapping[str, RangePartition],
    *,
    method: str = "bsearch",
) -> Op:
    """INSTR(F, Q) (Fig. 6 r7): the instrumented plan whose single
    output row holds one sorted fragment array per sketched relation."""
    missing = set(partitions) - q.relations()
    if missing:
        raise ValueError(f"partitions for relations not in query: {missing}")
    p = _prop(q, partitions, method)
    aggs = tuple(
        AggSpec("sketch", p.anns[rel][0], p.anns[rel][0])
        for rel in sorted(p.anns)
    )
    if not aggs:
        raise ValueError("no relation of the query is partitioned")
    return Aggregate(p.op, (), aggs)


def capture_sketch(
    q: Op,
    tables: Mapping[str, DataFrame],
    partitions: Mapping[str, RangePartition],
    *,
    method: str = "bsearch",
) -> dict[str, ProvenanceSketch]:
    """Run INSTR(F, Q) on Spark; decode the result into sketches."""
    plan = instrument(q, partitions, method=method)
    row = compile_op(plan, tables).collect()[0]
    out: dict[str, ProvenanceSketch] = {}
    for rel, part in partitions.items():
        frags = row[ann_col(rel)] or []
        out[rel] = ProvenanceSketch(part, frozenset(int(f) for f in frags))
    return out
