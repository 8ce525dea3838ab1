"""T8 / paper Fig. 13 — end-to-end self-tuning over parameterized
workloads.

Streams of template instances with normal-distributed parameters are
answered by a PBDS strategy (eager/adaptive) and compared against
running every query without PBDS. Reported per workload: total times,
the speedup, the break-even query index (the paper's "start to gain
from the 133rd query"), and strategy action counts. A selectivity
sweep varies the parameter mean; an SDV sweep varies parameter
clustering (smaller SDV -> fewer sketches cover the stream).
"""
from __future__ import annotations

import numpy as np

from repro.core.selftune import SelfTuningDriver
from repro.experiments.common import Dataset, fmt_table
from repro.physical.stats import table_stats_pandas

COLUMNS = (
    "workload", "strategy", "n_queries", "pbds_total_s", "nops_total_s",
    "speedup", "breakeven_idx", "captures", "reuses", "plain",
)


def run_stream(
    ds: Dataset,
    template,
    bindings_fn,
    *,
    n_queries: int,
    strategy: str,
    n_frag: int,
    patience: int = 2,
    seed: int = 0,
    label: str = "",
) -> dict:
    g = np.random.default_rng(seed)
    stats = table_stats_pandas(ds.pdb)
    partitions = {
        (rel, attr): ds.partition(rel, attr, n_frag)
        for rel, attr in template.sketch_attrs.items()
    }
    driver = SelfTuningDriver(
        ds.disk,
        {template.name: template.sketch_attrs},
        partitions,
        stats=stats,
        strategy=strategy,
        patience=patience,
    )
    for _ in range(n_queries):
        raw = template.sample_bindings(g)
        driver.run(template.name, template.instance(**bindings_fn(raw)))
    cum = driver.cumulative()
    pbds_total, nops_total = cum[-1]
    breakeven = next((i + 1 for i, (p, n) in enumerate(cum) if p < n), None)
    actions = [e.action for e in driver.events]
    use_events = [e for e in driver.events if e.action == "use"]
    return {
        # the per-query ledger for sketch-answered queries only: the
        # reproducible Fig. 13 claim that using a sketch beats not
        # using one, independent of capture amortization
        "use_total_s": sum(e.seconds for e in use_events),
        "use_nops_total_s": sum(e.nops_seconds for e in use_events),
        "workload": label or template.name,
        "strategy": strategy,
        "n_queries": n_queries,
        "pbds_total_s": pbds_total,
        "nops_total_s": nops_total,
        "speedup": nops_total / pbds_total if pbds_total > 0 else float("inf"),
        "breakeven_idx": breakeven,
        "captures": actions.count("capture"),
        "reuses": actions.count("use"),
        "plain": actions.count("plain"),
        "cumulative": cum,
    }


def format_table(rows) -> str:
    return fmt_table(
        rows, COLUMNS, "T8 (Fig. 13): end-to-end self-tuning workloads"
    )
