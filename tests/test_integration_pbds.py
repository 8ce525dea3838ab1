"""End-to-end PBDS pipeline per workload query:

safety check (Sec. 5) -> equi-depth partition (Sec. 9.3) -> capture by
instrumentation (Sec. 7) -> Q[P] rewrite (Sec. 8) -> the rewritten
query must return exactly the original result (checked against the
DuckDB oracle), and the captured sketch must match the interpreter's
accurate sketch.
"""
import pytest

from repro.algebra.compile_spark import compile_op
from repro.algebra.interp import accurate_sketch
from repro.algebra.to_sql import to_sql
from repro.core.capture import capture_sketch
from repro.core.ranges import equi_depth
from repro.core.safety import is_safe
from repro.core.use import apply_sketches
from repro.oracle import assert_equivalent
from repro.physical.stats import table_stats_pandas
from repro.workloads import crimes as WC
from repro.workloads import movies as WM
from repro.workloads import sof as WS
from repro.workloads import tpch as WT


def run_pbds(q, sdb, pdb, sketch_attrs, stats, n_frag, *, check_accurate=True):
    """The full pipeline; returns the sketches used."""
    # 1. safety: the chosen attributes must pass the Sec. 5 check
    for rel, attr in sketch_attrs.items():
        assert is_safe(q, {rel: [attr]}, stats).safe, (rel, attr)
    # 2. partitions from equi-depth statistics
    parts = {
        rel: equi_depth(pdb[rel][attr], rel, attr, n_frag)
        for rel, attr in sketch_attrs.items()
    }
    # 3. capture == accurate lineage sketch
    sk = capture_sketch(q, sdb, parts)
    if check_accurate:
        acc = accurate_sketch(q, pdb, parts, minmax_witness=True)
        for rel in parts:
            assert sk[rel].fragments == acc[rel], rel
    # 4. Q[P] answers exactly like Q (oracle over the full inputs)
    assert_equivalent(compile_op(apply_sketches(q, sk), sdb), to_sql(q), **pdb)
    return sk


class TestTpchPipeline:
    @pytest.mark.parametrize("qname", ["Q3", "Q10", "Q15", "Q18", "Q19"])
    @pytest.mark.parametrize("n_frag", [16, 64])
    def test_full_pipeline(self, qname, n_frag, tpch_db, tpch_pdb):
        q = WT.all_queries()[qname]
        stats = table_stats_pandas(tpch_pdb)
        run_pbds(q, tpch_db, tpch_pdb, WT.SKETCH_ATTRS[qname], stats, n_frag)

    def test_q3_sketch_is_selective(self, tpch_db, tpch_pdb):
        q = WT.q3()
        stats = table_stats_pandas(tpch_pdb)
        sk = run_pbds(q, tpch_db, tpch_pdb, WT.SKETCH_ATTRS["Q3"], stats, 64)
        # a top-10 query over thousands of orders: few fragments qualify
        assert sk["orders"].selectivity() < 0.5

    def test_more_fragments_more_selective(self, tpch_db, tpch_pdb):
        q = WT.q3()
        parts = {
            rel: equi_depth(tpch_pdb[rel][a], rel, a, n)
            for n in (8,)
            for rel, a in WT.SKETCH_ATTRS["Q3"].items()
        }
        coarse = capture_sketch(q, tpch_db, parts)
        parts_fine = {
            rel: equi_depth(tpch_pdb[rel][a], rel, a, 128)
            for rel, a in WT.SKETCH_ATTRS["Q3"].items()
        }
        fine = capture_sketch(q, tpch_db, parts_fine)
        assert fine["orders"].selectivity() <= coarse["orders"].selectivity()


class TestCrimesPipeline:
    @pytest.mark.parametrize("n_frag", [8, 32])
    def test_cq1(self, n_frag, crimes_db, crimes_pdb):
        stats = table_stats_pandas(crimes_pdb)
        run_pbds(WC.cq1(), crimes_db, crimes_pdb, WC.SKETCH_ATTRS["C-Q1"], stats, n_frag)

    @pytest.mark.parametrize("t", [50, 150])
    def test_cq2(self, t, crimes_db, crimes_pdb):
        stats = table_stats_pandas(crimes_pdb)
        run_pbds(WC.cq2(t), crimes_db, crimes_pdb, WC.SKETCH_ATTRS["C-Q2"], stats, 32)


class TestMoviesPipeline:
    def test_mq1(self, movies_db, movies_pdb):
        stats = table_stats_pandas(movies_pdb)
        run_pbds(WM.mq1(), movies_db, movies_pdb, WM.SKETCH_ATTRS["M-Q1"], stats, 32)

    def test_mq2(self, movies_db, movies_pdb):
        stats = table_stats_pandas(movies_pdb)
        run_pbds(WM.mq2(150), movies_db, movies_pdb, WM.SKETCH_ATTRS["M-Q2"], stats, 32)

    def test_mq3(self, movies_db, movies_pdb):
        stats = table_stats_pandas(movies_pdb)
        run_pbds(WM.mq3(), movies_db, movies_pdb, WM.SKETCH_ATTRS["M-Q3"], stats, 32)


class TestSofPipeline:
    @pytest.mark.parametrize("mk,name", [(WS.sq1, "S-Q1"), (WS.sq2, "S-Q2"), (WS.sq4, "S-Q4")])
    def test_topk(self, mk, name, sof_db, sof_pdb):
        stats = table_stats_pandas(sof_pdb)
        run_pbds(mk(), sof_db, sof_pdb, WS.SKETCH_ATTRS[name], stats, 32)

    def test_sq5(self, sof_db, sof_pdb):
        stats = table_stats_pandas(sof_pdb)
        run_pbds(WS.sq5(8, 20), sof_db, sof_pdb, WS.SKETCH_ATTRS["S-Q5"], stats, 32)


class TestSketchReuseOnSpark:
    def test_captured_sketch_answers_reusable_instance(self, crimes_db, crimes_pdb):
        """Thm. 3 on the engine: capture for t=50, answer t=120 with it."""
        from repro.core.reuse import reusable

        stats = table_stats_pandas(crimes_pdb)
        q_old, q_new = WC.cq2(50), WC.cq2(120)
        assert reusable(q_new, q_old, stats).reusable
        part = equi_depth(crimes_pdb["crimes"]["cr_block"], "crimes", "cr_block", 32)
        sk = capture_sketch(q_old, crimes_db, {"crimes": part})
        assert_equivalent(
            compile_op(apply_sketches(q_new, sk), crimes_db),
            to_sql(q_new),
            **crimes_pdb,
        )

    def test_sq5_interval_reuse(self, sof_db, sof_pdb):
        from repro.core.reuse import reusable

        q_old, q_new = WS.sq5(5, 40), WS.sq5(10, 30)
        assert reusable(q_new, q_old, None).reusable
        part = equi_depth(sof_pdb["comments"]["c_user"], "comments", "c_user", 16)
        sk = capture_sketch(q_old, sof_db, {"comments": part})
        assert_equivalent(
            compile_op(apply_sketches(q_new, sk), sof_db),
            to_sql(q_new),
            **sof_pdb,
        )
