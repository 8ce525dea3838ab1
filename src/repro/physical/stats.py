"""Database statistics (min/max per attribute, equi-depth histograms).

The paper's safety check (Sec. 5) bounds base-attribute values with
``min(a) <= a <= max(a)`` from DBMS statistics, and its partitions are
derived from the DBMS's equi-depth histograms (Sec. 9.3). These
helpers compute both from Spark or pandas tables.
"""
from __future__ import annotations

from typing import Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def table_stats_pandas(
    db: Mapping[str, pd.DataFrame], attrs: Mapping[str, Sequence[str]] | None = None
) -> dict[str, dict[str, tuple]]:
    """{relation: {attr: (min, max)}} for the given (or all orderable)
    attributes."""
    out: dict[str, dict[str, tuple]] = {}
    for rel, df in db.items():
        cols = attrs.get(rel, df.columns) if attrs else df.columns
        st: dict[str, tuple] = {}
        for c in cols:
            if c not in df.columns or len(df) == 0:
                continue
            try:
                lo, hi = df[c].min(), df[c].max()
            except TypeError:
                continue
            lo = lo.item() if hasattr(lo, "item") else lo
            hi = hi.item() if hasattr(hi, "item") else hi
            st[c] = (lo, hi)
        out[rel] = st
    return out


def table_stats_spark(
    tables: Mapping[str, DataFrame], attrs: Mapping[str, Sequence[str]]
) -> dict[str, dict[str, tuple]]:
    """Same as above but computed by Spark aggregation."""
    out: dict[str, dict[str, tuple]] = {}
    for rel, df in tables.items():
        cols = [c for c in attrs.get(rel, []) if c in df.columns]
        if not cols:
            out[rel] = {}
            continue
        exprs = []
        for c in cols:
            exprs.append(F.min(c).alias(f"min_{c}"))
            exprs.append(F.max(c).alias(f"max_{c}"))
        row = df.agg(*exprs).collect()[0]
        out[rel] = {c: (row[f"min_{c}"], row[f"max_{c}"]) for c in cols}
    return out
