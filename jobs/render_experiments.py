"""Render all measured tables from jobs/out/*.json (no Spark).

Used to (re)fill the measured sections of EXPERIMENTS.md after running
the table jobs:

    python jobs/render_experiments.py            # print all tables
"""
from _common import load_rows

from repro.experiments import (
    fig09_selectivity,
    fig10_realworld,
    fig11_tpch,
    fig12_capture_opts,
    fig13_endtoend,
    fig14_amortization,
    t9_checks,
)


def tables() -> dict[str, str]:
    out = {}
    specs = [
        ("T1", "fig09", fig09_selectivity.format_table),
        ("T2", "fig12a", fig12_capture_opts.format_init_table),
        ("T3", "fig12b", fig12_capture_opts.format_merge_table),
        ("T4", "fig11", fig11_tpch.format_table),
        ("T6", "fig14", fig14_amortization.format_table),
        ("T7", "fig10", fig10_realworld.format_table),
        ("T9", "t9", t9_checks.format_table),
    ]
    for label, name, fmt in specs:
        rows = load_rows(name)
        out[label] = fmt(rows) if rows else f"{label}: {name}.json missing"
    rows = load_rows("fig13")
    if rows:
        printable = [
            {k: v for k, v in r.items() if k != "cumulative"} for r in rows
        ]
        out["T8"] = fig13_endtoend.format_table(printable)
    else:
        out["T8"] = "T8: fig13.json missing"
    return out


if __name__ == "__main__":
    for label, text in sorted(tables().items()):
        print(text)
        print()
