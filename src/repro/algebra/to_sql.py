"""IR -> SQL text.

Used to run the *same* logical query on DuckDB for the correctness
oracle (``repro.oracle.assert_equivalent``) and for debugging. The
translation is a straightforward nesting of derived tables; DuckDB's
optimizer handles the rest.
"""
from __future__ import annotations

import itertools

from repro.algebra.ops import (
    Aggregate,
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


def to_sql(q: Op) -> str:
    """Render ``q`` as a standalone SQL query (DuckDB dialect)."""
    counter = itertools.count()

    def alias() -> str:
        return f"t{next(counter)}"

    def render(op: Op) -> str:
        if isinstance(op, TableAccess):
            cols = ", ".join(op.table_schema)
            return f"SELECT {cols} FROM {op.name}"
        if isinstance(op, Select):
            return (
                f"SELECT * FROM ({render(op.child)}) {alias()} "
                f"WHERE {op.cond.to_sql()}"
            )
        if isinstance(op, Project):
            items = ", ".join(f"{e.to_sql()} AS {a}" for e, a in op.items)
            return f"SELECT {items} FROM ({render(op.child)}) {alias()}"
        if isinstance(op, Aggregate):
            parts = list(op.group_by)
            for a in op.aggs:
                if a.func == "count" and a.attr is None:
                    parts.append(f"count(*) AS {a.alias}")
                elif a.func == "sketch":
                    # merge sketch annotations: ints or lists of ints
                    parts.append(
                        f"list_sort(list_distinct(flatten(list([{a.attr}])))) "
                        f"AS {a.alias}"
                    )
                else:
                    parts.append(f"{a.func}({a.attr}) AS {a.alias}")
            sel = ", ".join(parts)
            grp = (
                f" GROUP BY {', '.join(op.group_by)}" if op.group_by else ""
            )
            return f"SELECT {sel} FROM ({render(op.child)}) {alias()}{grp}"
        if isinstance(op, Join):
            return (
                f"SELECT * FROM ({render(op.left)}) {alias()} "
                f"JOIN ({render(op.right)}) {alias()} ON {op.cond.to_sql()}"
            )
        if isinstance(op, CrossProduct):
            return (
                f"SELECT * FROM ({render(op.left)}) {alias()} "
                f"CROSS JOIN ({render(op.right)}) {alias()}"
            )
        if isinstance(op, Union):
            lcols = ", ".join(op.left.schema())
            rcols = ", ".join(op.right.schema())
            return (
                f"SELECT {lcols} FROM ({render(op.left)}) {alias()} "
                f"UNION ALL "
                f"SELECT {rcols} FROM ({render(op.right)}) {alias()}"
            )
        if isinstance(op, Distinct):
            return f"SELECT DISTINCT * FROM ({render(op.child)}) {alias()}"
        if isinstance(op, TopK):
            order = ", ".join(
                f"{c} {'ASC' if asc else 'DESC'}" for c, asc in op.order
            )
            return (
                f"SELECT * FROM ({render(op.child)}) {alias()} "
                f"ORDER BY {order} LIMIT {op.k}"
            )
        raise TypeError(f"cannot render {type(op).__name__}")

    return render(q)
