"""T1 (Fig. 9) — sketch selectivity benchmarks.

Benchmarks the capture of the Q3 sketch at several partition sizes and
prints the full selectivity table (the Fig. 9 data) once.
"""
import pytest

from repro.core.capture import capture_sketch
from repro.experiments import fig09_selectivity
from repro.workloads import tpch


@pytest.fixture(scope="module")
def selectivity_table(spark, tpch_ds):
    rows = fig09_selectivity.run(spark, tpch_ds, n_frags=(32, 400, 4000))
    print("\n" + fig09_selectivity.format_table(rows))
    return rows


@pytest.mark.parametrize("n_frag", [32, 400, 4000])
def test_capture_q3_selectivity(benchmark, tpch_ds, selectivity_table, n_frag):
    q = tpch.q3()
    parts = tpch_ds.partitions(tpch.SKETCH_ATTRS["Q3"], n_frag)

    def capture():
        return capture_sketch(q, tpch_ds.mem, parts)

    sk = benchmark.pedantic(capture, rounds=3, iterations=1, warmup_rounds=1)
    # top-10 query: the sketch must be selective (shape check vs Fig. 9)
    assert sk["orders"].selectivity() <= 0.6


def test_selectivity_shrinks_with_fragments(selectivity_table):
    """Fig. 9's monotone trend: finer partitions -> smaller coverage."""
    by_q = {}
    for r in selectivity_table:
        by_q.setdefault((r["query"], r["relation"]), []).append(
            (r["n_fragments"], r["pct_rows_covered"])
        )
    for key, pairs in by_q.items():
        pairs.sort()
        coverages = [c for _, c in pairs]
        assert coverages[0] >= coverages[-1] - 1e-6, (key, pairs)
