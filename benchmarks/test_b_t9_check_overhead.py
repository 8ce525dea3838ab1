"""T9 (Sec. 9.5) — safety / reuse check overhead.

The paper measures ~20 ms per Z3-based check; our specialized solver
is faster, but the claim to reproduce is "negligible next to query
execution", i.e. well under the millisecond-to-seconds query times."""
import pytest

from repro.core.reuse import reusable
from repro.core.safety import is_safe
from repro.physical.stats import table_stats_pandas
from repro.workloads import crimes as WC
from repro.workloads import tpch as WT


@pytest.fixture(scope="module")
def stats():
    return {
        "tpch": table_stats_pandas(WT.tables_pandas(sf=0.001)),
        "crimes": table_stats_pandas(WC.tables_pandas(sf=0.0005)),
    }


def test_safety_check_q3(benchmark, stats):
    q = WT.q3()
    x = {r: [a] for r, a in WT.SKETCH_ATTRS["Q3"].items()}
    assert benchmark(is_safe, q, x, stats["tpch"]).safe


def test_safety_check_q18(benchmark, stats):
    q = WT.q18(280.0)
    x = {r: [a] for r, a in WT.SKETCH_ATTRS["Q18"].items()}
    assert benchmark(is_safe, q, x, stats["tpch"]).safe


def test_reuse_check_q18(benchmark, stats):
    assert benchmark(reusable, WT.q18(300.0), WT.q18(280.0), stats["tpch"]).reusable


def test_reuse_check_cq2(benchmark, stats):
    assert benchmark(reusable, WC.cq2(150), WC.cq2(100), stats["crimes"]).reusable
