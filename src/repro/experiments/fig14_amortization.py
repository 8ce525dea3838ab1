"""T6 / paper Fig. 14 — optimal partition size by number of repetitions.

Using the measured costs from the Fig. 11 experiment (C_NoPS, C_cap,
C_use per partition size), the total cost of answering a query n times
is n*C_NoPS without PBDS and C_cap + n*C_use with a sketch. For each
query this reports the interval of n in which each option is optimal —
the paper's finding is that capture amortizes after 1-2 repetitions
for most queries.
"""
from __future__ import annotations

from repro.core.selftune import amortization_table
from repro.experiments.common import fmt_table

COLUMNS = ("query", "option", "from_runs", "to_runs")


def run_from_fig11(fig11_rows, *, storage: str = "disk") -> list[dict]:
    """Derive the Fig. 14 intervals from measured Fig. 11 rows."""
    by_query: dict[str, dict] = {}
    for r in fig11_rows:
        if r["storage"] != storage:
            continue
        q = by_query.setdefault(r["query"], {"nops": r["nops_s"], "opts": {}})
        if r.get("coverage", 0.0) >= 0.999:
            # the sketch covers the whole partition: Q[P] is literally
            # Q, so the option is No-PS plus capture cost — listing it
            # would only report measurement noise (paper blacks out
            # such cells)
            continue
        q["opts"][f"PS{r['n_fragments']}"] = (r["cap_s"], r["ps_s"])
    rows = []
    for qname, info in by_query.items():
        for option, lo, hi in amortization_table(info["nops"], info["opts"]):
            rows.append(
                {
                    "query": qname,
                    "option": option,
                    "from_runs": lo,
                    "to_runs": hi if hi is not None else "inf",
                }
            )
    return rows


def format_table(rows) -> str:
    return fmt_table(
        rows,
        COLUMNS,
        "T6 (Fig. 14): optimal option per number of query repetitions "
        "[from_runs, to_runs)",
    )
