"""Every workload query, run on Spark, checked against the DuckDB
oracle over the same synthetic inputs."""
import pytest

from repro.algebra.compile_spark import compile_op
from repro.algebra.to_sql import to_sql
from repro.oracle import assert_equivalent
from repro.workloads import crimes as WC
from repro.workloads import movies as WM
from repro.workloads import sof as WS
from repro.workloads import tpch as WT


class TestTpch:
    @pytest.mark.parametrize("qname", ["Q1", "Q3", "Q10", "Q15", "Q18", "Q19"])
    def test_query_matches_oracle(self, qname, tpch_db, tpch_pdb):
        q = WT.all_queries()[qname]
        assert_equivalent(compile_op(q, tpch_db), to_sql(q), **tpch_pdb)

    def test_q18_param_sweep(self, tpch_db, tpch_pdb):
        for t in (250.0, 280.0, 310.0):
            q = WT.q18(t)
            assert_equivalent(compile_op(q, tpch_db), to_sql(q), **tpch_pdb)

    def test_q3_returns_at_most_10(self, tpch_db):
        assert compile_op(WT.q3(), tpch_db).count() <= 10

    def test_q1_nonselective(self, tpch_pdb):
        # Q1's provenance covers ~all of lineitem (the "no benefit" case)
        from repro.algebra.interp import provenance

        p = provenance(WT.q1(), tpch_pdb)
        assert len(p["lineitem"]) / len(tpch_pdb["lineitem"]) > 0.9


class TestCrimes:
    def test_cq1(self, crimes_db, crimes_pdb):
        assert_equivalent(compile_op(WC.cq1(), crimes_db), to_sql(WC.cq1()), **crimes_pdb)

    @pytest.mark.parametrize("t", [50, 100, 200])
    def test_cq2(self, t, crimes_db, crimes_pdb):
        q = WC.cq2(t)
        assert_equivalent(compile_op(q, crimes_db), to_sql(q), **crimes_pdb)


class TestMovies:
    def test_mq1(self, movies_db, movies_pdb):
        assert_equivalent(compile_op(WM.mq1(), movies_db), to_sql(WM.mq1()), **movies_pdb)

    @pytest.mark.parametrize("t", [100, 300])
    def test_mq2(self, t, movies_db, movies_pdb):
        q = WM.mq2(t)
        assert_equivalent(compile_op(q, movies_db), to_sql(q), **movies_pdb)

    def test_mq3(self, movies_db, movies_pdb):
        assert_equivalent(compile_op(WM.mq3(), movies_db), to_sql(WM.mq3()), **movies_pdb)


class TestSof:
    @pytest.mark.parametrize("mk", [WS.sq1, WS.sq2, WS.sq4])
    def test_topk_queries(self, mk, sof_db, sof_pdb):
        q = mk()
        assert_equivalent(compile_op(q, sof_db), to_sql(q), **sof_pdb)

    @pytest.mark.parametrize("lo,hi", [(5, 15), (10, 30)])
    def test_sq5(self, lo, hi, sof_db, sof_pdb):
        q = WS.sq5(lo, hi)
        assert_equivalent(compile_op(q, sof_db), to_sql(q), **sof_pdb)
