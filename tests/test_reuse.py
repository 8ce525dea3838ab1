"""Sketch reuse for parameterized queries (paper Sec. 6, Fig. 4).

Decision tests on the paper's Example 7 and on the workload templates,
plus soundness property tests: whenever ``reusable`` approves, the old
instance's accurate sketch must answer the new instance correctly
(provenance containment, Lem. 8/9, checked via the interpreter).
"""
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.algebra.expr import And, Col, Lit, Param
from repro.algebra.interp import accurate_sketch, result_frame, sketch_instance
from repro.algebra.ops import Aggregate, AggSpec, Project, Select, TableAccess, TopK
from repro.core.reuse import ge, non_grp_pred, reusable, uconds
from repro.core.ranges import equi_depth
from repro.physical.stats import table_stats_pandas
from repro.workloads import crimes as WC
from repro.workloads import sof as WS
from repro.workloads import tpch as WT

CITIES = pd.DataFrame(
    {
        "popden": [4200, 6000, 5000, 7000, 2000, 3700, 2500, 3100, 8000],
        "city": [f"c{i}" for i in range(9)],
        "state": ["AK", "CA", "CA", "NY", "NY", "TX", "TX", "CA", "NY"],
    }
)
SCAN = TableAccess("cities", ("popden", "city", "state"))
STATS = table_stats_pandas({"cities": CITIES})


def example7(p1, p2):
    """Paper Fig. 5: states with more than $2 cities of >= $1 density."""
    sel = Select(SCAN, Col("popden").gt(Lit(p1)))
    agg = Aggregate(sel, ("state",), (AggSpec("count", None, "cnt"),))
    return Select(agg, Col("cnt").gt(Lit(p2)))


class TestExample7:
    def test_more_restrictive_reusable(self):
        # Q: cnt > 10; Q': cnt > 15  -> PS of Q answers Q' (paper Ex. 7)
        q = example7(100, 10)
        q_new = example7(100, 15)
        assert reusable(q_new, q, STATS).reusable

    def test_less_restrictive_not_reusable(self):
        q = example7(100, 15)
        q_new = example7(100, 10)
        assert not reusable(q_new, q, STATS).reusable

    def test_same_instance_reusable(self):
        q = example7(100, 10)
        assert reusable(example7(100, 10), q, STATS).reusable

    def test_inner_param_tightened_reusable(self):
        # raising $1 shrinks every group (condition (2) holds), so
        # cnt >= cnt' and the HAVING still transfers: P(Q') <= P(Q)
        q = example7(5000, 1)
        q_new = example7(6000, 1)
        assert reusable(q_new, q, STATS).reusable

    def test_inner_param_loosened_not_reusable(self):
        # lowering $1 grows the groups; pred(Q') no longer implies pred(Q)
        q = example7(6000, 1)
        q_new = example7(5000, 1)
        assert not reusable(q_new, q, STATS).reusable

    def test_ge_psi_has_cnt_equality(self):
        q = example7(100, 10)
        r = ge(example7(100, 15), q, STATS)
        assert r.reusable and r.psi.get("cnt") == "="

    def test_uconds_direction(self):
        q = example7(100, 10)
        r = ge(example7(100, 15), q, STATS)
        assert uconds(example7(100, 15), q, r.psi, STATS)
        assert not uconds(example7(100, 5), q, ge(example7(100, 5), q, STATS).psi, STATS)


class TestStructuralChecks:
    def test_different_shape_rejected(self):
        q = example7(100, 10)
        other = Aggregate(SCAN, ("state",), (AggSpec("count", None, "cnt"),))
        assert not reusable(other, q, STATS).reusable

    def test_different_relation_rejected(self):
        r2 = TableAccess("other", ("popden", "city", "state"))
        q1 = Select(SCAN, Col("popden").gt(Lit(10)))
        q2 = Select(r2, Col("popden").gt(Lit(10)))
        assert not reusable(q2, q1, None).reusable

    def test_spread_selection_conditions(self):
        # paper Sec. 6: sigma_{a=20}(sigma_{a>30}) vs sigma_{a=20}(sigma_{a>10})
        q_old = Select(Select(SCAN, Col("popden").gt(Lit(30))), Col("popden").eq(Lit(20)))
        q_new = Select(Select(SCAN, Col("popden").gt(Lit(10))), Col("popden").eq(Lit(20)))
        # per-selection checking would fail; uconds on the conjunction
        # succeeds (a = 20 implies a > 30 is vacuous only with a=20 in hyp
        # ... here: a' = 20 and a = a' prove both a = 20 and a > 30? No:
        # a = 20 cannot prove a > 30 — but pred(Q) = (a > 30) AND (a = 20)
        # is unsatisfiable-with-a'=20; our sound checker rejects.
        r = reusable(q_new, q_old, None)
        assert isinstance(r.reusable, bool)  # decision exists; soundness
        # the symmetric pair where implication genuinely holds:
        q_old2 = Select(Select(SCAN, Col("popden").gt(Lit(10))), Col("popden").gt(Lit(15)))
        q_new2 = Select(Select(SCAN, Col("popden").gt(Lit(20))), Col("popden").gt(Lit(25)))
        assert reusable(q_new2, q_old2, STATS).reusable

    def test_topk_same_spec_reusable(self):
        q = WC.cq1()
        assert reusable(WC.cq1(), q, None).reusable

    def test_non_grp_pred_drops_group_only_conjuncts(self):
        sel = Select(SCAN, And(Col("state").gt(Lit("AA")), Col("popden").gt(Lit(10))))
        # conjunct on the group attr only is dropped
        kept = non_grp_pred(sel, ("state",), None)
        sqls = [c.to_sql() for c in kept]
        assert "(popden > 10)" in " ".join(sqls)
        assert all("state" not in s or "popden" in s for s in sqls)


class TestWorkloadTemplates:
    def test_cq2_monotone_threshold(self):
        stats = table_stats_pandas(WC.tables_pandas(sf=0.0003))
        old = WC.cq2(50)
        assert reusable(WC.cq2(80), old, stats).reusable
        assert not reusable(WC.cq2(20), old, stats).reusable

    def test_sq5_interval_containment(self):
        old = WS.sq5(30, 70)
        assert reusable(WS.sq5(40, 60), old, None).reusable
        assert reusable(WS.sq5(30, 70), old, None).reusable
        assert not reusable(WS.sq5(20, 60), old, None).reusable
        assert not reusable(WS.sq5(40, 80), old, None).reusable

    def test_q18_threshold(self):
        stats = table_stats_pandas(WT.tables_pandas(sf=0.001))
        old = WT.q18(250.0)
        assert reusable(WT.q18(280.0), old, stats).reusable
        assert not reusable(WT.q18(200.0), old, stats).reusable

    def test_template_instance_binding(self):
        t = WT.q18_template()
        inst = t.instance(t=275)
        assert inst.params() == frozenset()
        assert reusable(inst, WT.q18(250.0), table_stats_pandas(WT.tables_pandas(sf=0.001))).reusable


class TestReuseSoundnessProperty:
    """Approved reuse pairs must actually produce correct answers from
    the old sketch's instance (Thm. 3, checked empirically)."""

    @given(
        st.integers(1, 4),  # old threshold
        st.integers(0, 4),  # delta for the new threshold
        st.integers(2, 5),  # fragments
    )
    @settings(max_examples=40, deadline=None)
    def test_cq2_style_reuse(self, t_old, delta, n_frag):
        db = {"cities": CITIES}
        q_old = Select(
            Aggregate(SCAN, ("state",), (AggSpec("count", None, "cnt"),)),
            Col("cnt").gt(Lit(t_old)),
        )
        q_new = Select(
            Aggregate(SCAN, ("state",), (AggSpec("count", None, "cnt"),)),
            Col("cnt").gt(Lit(t_old + delta)),
        )
        if not reusable(q_new, q_old, STATS).reusable:
            return
        part = equi_depth(CITIES["popden"], "cities", "popden", n_frag)
        sk = accurate_sketch(q_old, db, {"cities": part})
        inst = sketch_instance(db, {"cities": part}, sk)
        got = result_frame(q_new, inst).sort_values("state").reset_index(drop=True)
        exp = result_frame(q_new, db).sort_values("state").reset_index(drop=True)
        pd.testing.assert_frame_equal(got, exp, check_dtype=False)
