"""T1 / paper Fig. 9 — provenance-sketch selectivity on TPC-H.

For each TPC-H query and each relation it sketches, capture the
accurate sketch at several partition sizes and report the fraction of
the relation's *rows* covered by the sketch (the paper's y-axis).
"""
from __future__ import annotations

from repro.core.capture import capture_sketch
from repro.experiments.common import Dataset, fmt_table
from repro.workloads import tpch

COLUMNS = ("query", "relation", "n_fragments", "pct_rows_covered")


def row_coverage(ds: Dataset, rel: str, part, fragments) -> float:
    """Exact % of rows of ``rel`` inside the sketch's fragments."""
    col = ds.pdb[rel][part.attr]
    frags = part.fragment_of_series(col)
    return 100.0 * frags.isin(set(fragments)).mean()


def run(spark, ds: Dataset, n_frags=(32, 400, 4000)) -> list[dict]:
    rows = []
    for qname, q in tpch.all_queries().items():
        attrs = tpch.SKETCH_ATTRS[qname]
        if not attrs:
            continue
        for n in n_frags:
            parts = ds.partitions(attrs, n)
            sketches = capture_sketch(q, ds.mem, parts)
            for rel, sk in sketches.items():
                rows.append(
                    {
                        "query": qname,
                        "relation": rel,
                        "n_fragments": parts[rel].n_fragments,
                        "pct_rows_covered": row_coverage(
                            ds, rel, parts[rel], sk.fragments
                        ),
                    }
                )
    return rows


def format_table(rows) -> str:
    return fmt_table(
        rows, COLUMNS, "T1 (Fig. 9): sketch selectivity, % of rows covered"
    )
