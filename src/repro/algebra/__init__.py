"""Relational-algebra substrate.

The paper (Sec. 3.1, Fig. 2) defines a bag relational algebra with
selection, projection, aggregation, top-k, join, cross product, union,
and duplicate elimination. PBDS instruments queries at this level, so
the reproduction needs its own logical IR:

* ``expr``           — scalar expressions (columns, literals, params,
                        arithmetic, comparisons, boolean connectives)
* ``ops``            — operators with schema inference
* ``to_sql``         — IR -> SQL text (DuckDB oracle + debugging)
* ``compile_spark``  — IR -> Spark DataFrame (Catalyst optimizes it)
* ``interp``         — pandas reference evaluator with exact lineage,
                        the ground truth for provenance-sketch capture
"""
from repro.algebra.expr import (  # noqa: F401
    And,
    BinOp,
    Cmp,
    Col,
    Expr,
    Lit,
    Not,
    Or,
    Param,
    between,
    col,
    lit,
)
from repro.algebra.ops import (  # noqa: F401
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
