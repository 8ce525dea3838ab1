"""T9 / paper Sec. 9.5 — safety- and reuse-check overhead.

The paper measures ~20 ms per safety or reuse check (Z3-based) and
argues both are negligible: safety runs once per template, reuse once
per stored sketch per incoming query. This reproduces the measurement
with our solver over every workload template.
"""
from __future__ import annotations

import time

from repro.core.reuse import reusable
from repro.core.safety import is_safe
from repro.experiments.common import fmt_table
from repro.physical.stats import table_stats_pandas
from repro.workloads import crimes as WC
from repro.workloads import movies as WM
from repro.workloads import sof as WS
from repro.workloads import tpch as WT

COLUMNS = ("check", "query", "ms_per_check")


def _cases():
    tpch_stats = table_stats_pandas(WT.tables_pandas(sf=0.001))
    crimes_stats = table_stats_pandas(WC.tables_pandas(sf=0.0005))
    safety = [
        ("Q3", WT.q3(), {r: [a] for r, a in WT.SKETCH_ATTRS["Q3"].items()}, tpch_stats),
        ("Q18", WT.q18(280.0), {r: [a] for r, a in WT.SKETCH_ATTRS["Q18"].items()}, tpch_stats),
        ("C-Q2", WC.cq2(100), {"crimes": ["cr_block"]}, crimes_stats),
        ("M-Q3", WM.mq3(), {r: [a] for r, a in WM.SKETCH_ATTRS["M-Q3"].items()}, None),
        ("S-Q5", WS.sq5(10, 20), {r: [a] for r, a in WS.SKETCH_ATTRS["S-Q5"].items()}, None),
    ]
    reuse = [
        ("Q18", WT.q18(290.0), WT.q18(280.0), tpch_stats),
        ("C-Q2", WC.cq2(150), WC.cq2(100), crimes_stats),
        ("S-Q5", WS.sq5(12, 18), WS.sq5(10, 20), None),
    ]
    return safety, reuse


def run(repeat: int = 20) -> list[dict]:
    safety, reuse = _cases()
    rows = []
    for name, q, x, stats in safety:
        t0 = time.perf_counter()
        for _ in range(repeat):
            is_safe(q, x, stats)
        rows.append(
            {
                "check": "safety",
                "query": name,
                "ms_per_check": 1000 * (time.perf_counter() - t0) / repeat,
            }
        )
    for name, q_new, q_old, stats in reuse:
        t0 = time.perf_counter()
        for _ in range(repeat):
            reusable(q_new, q_old, stats)
        rows.append(
            {
                "check": "reuse",
                "query": name,
                "ms_per_check": 1000 * (time.perf_counter() - t0) / repeat,
            }
        )
    return rows


def format_table(rows) -> str:
    return fmt_table(
        rows, COLUMNS, "T9 (Sec. 9.5): safety / reuse check overhead"
    )
