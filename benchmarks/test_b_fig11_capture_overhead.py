"""T5 (Fig. 11b/e) — sketch-capture overhead.

One benchmark per query timing the instrumented (INSTR) plan at
PS-400; compare against the matching No-PS numbers from
test_b_fig11_tpch_runtime.py to get the paper's relative overhead
(usually < 100 % for moderate partition sizes).
"""
import pytest

from repro.algebra.compile_spark import compile_op
from repro.core.capture import instrument
from repro.workloads import tpch

QUERIES = ("Q3", "Q10", "Q15", "Q18", "Q19")


@pytest.mark.parametrize("qname", QUERIES)
def test_capture_ps400(benchmark, tpch_ds, qname):
    q = tpch.all_queries()[qname]
    parts = tpch_ds.partitions(tpch.SKETCH_ATTRS[qname], 400)
    plan = instrument(q, parts)
    row = benchmark.pedantic(
        lambda: compile_op(plan, tpch_ds.disk).collect(),
        rounds=3, iterations=1, warmup_rounds=1,
    )
    assert len(row) == 1  # INSTR returns exactly the sketch row
