"""Sketch capture by instrumentation (Fig. 6), per operator class.

Ground truth: the interpreter's exact-lineage ``accurate_sketch``.
Every captured sketch must (a) be a superset of the accurate sketch
(Def. 3) and (b) for these operator classes, equal it exactly —
aggregation's BITOR unions exactly the contributing fragments.
"""
import pandas as pd
import pytest

from repro.algebra.expr import And, Col, Lit, Or
from repro.algebra.interp import accurate_sketch
from repro.algebra.ops import (
    Aggregate,
    AggSpec,
    Distinct,
    Join,
    Project,
    Select,
    TableAccess,
    TopK,
    Union,
)
from repro.core.capture import ann_col, capture_sketch, instrument
from repro.core.ranges import RangePartition, equi_depth

CITIES = pd.DataFrame(
    {
        "popden": [4200, 6000, 5000, 7000, 2000, 3700, 2500],
        "city": ["Anchorage", "San Diego", "Sacramento", "New York", "Buffalo", "Austin", "Houston"],
        "state": ["AK", "CA", "CA", "NY", "NY", "TX", "TX"],
    }
)
STATES = pd.DataFrame({"st": ["CA", "NY", "TX"], "region": ["W", "E", "S"]})
SCAN = TableAccess("cities", ("popden", "city", "state"))
SSCAN = TableAccess("states", ("st", "region"))
F_STATE = RangePartition("cities", "state", ("DE", "MI", "OK"))
F_POPDEN = RangePartition("cities", "popden", (3000, 5000))
PDB = {"cities": CITIES, "states": STATES}


@pytest.fixture(scope="module")
def db(spark):
    return {
        "cities": spark.createDataFrame(CITIES),
        "states": spark.createDataFrame(STATES),
    }


def assert_capture_accurate(q, db, partitions, **kw):
    got = capture_sketch(q, db, partitions, **kw)
    exp = accurate_sketch(q, PDB, partitions, minmax_witness=True)
    for rel in partitions:
        assert got[rel].fragments == exp[rel], (
            rel,
            sorted(got[rel].fragments),
            sorted(exp[rel]),
        )


class TestPerOperator:
    def test_selection(self, db):
        q = Select(SCAN, Col("state").eq(Lit("CA")))
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_selection_popden_partition(self, db):
        q = Select(SCAN, Col("popden").gt(Lit(5500)))
        assert_capture_accurate(q, db, {"cities": F_POPDEN})

    def test_projection(self, db):
        q = Project(Select(SCAN, Col("state").eq(Lit("NY"))), ((Col("city"), "city"),))
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_aggregation_bitor(self, db):
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        assert_capture_accurate(q, db, {"cities": F_POPDEN})

    def test_aggregation_global(self, db):
        q = Aggregate(Select(SCAN, Col("state").eq(Lit("TX"))), (), (AggSpec("sum", "popden", "s"),))
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_topk_running_example(self, db):
        # paper Ex. 9: INSTR(F_state, Q2) yields {f1}
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        got = capture_sketch(q2, db, {"cities": F_STATE})
        assert got["cities"].fragments == frozenset({0})

    def test_join_propagates_both_sides(self, db):
        f_states = RangePartition("states", "st", ("M",))
        q = Join(Select(SCAN, Col("state").eq(Lit("NY"))), SSCAN, Col("state").eq(Col("st")))
        assert_capture_accurate(q, db, {"cities": F_STATE, "states": f_states})

    def test_join_single_side_partition(self, db):
        q = Join(SCAN, SSCAN, Col("state").eq(Col("st")))
        assert_capture_accurate(q, db, {"cities": F_POPDEN})

    def test_union_both_branches(self, db):
        q = Union(
            Select(SCAN, Col("state").eq(Lit("CA"))),
            Select(SCAN, Col("popden").gt(Lit(6500))),
        )
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_distinct_merges(self, db):
        q = Distinct(Project(SCAN, ((Col("state"), "state"),)))
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_minmax_witness_branch(self, db):
        # r3 min/max: only tuples attaining the extremum contribute
        q = Aggregate(SCAN, ("state",), (AggSpec("max", "popden", "mx"),))
        got = capture_sketch(q, db, {"cities": F_POPDEN})
        exp = accurate_sketch(q, PDB, {"cities": F_POPDEN}, minmax_witness=True)
        assert got["cities"].fragments == exp["cities"]
        # and it is strictly smaller than whole-group lineage here
        full = accurate_sketch(q, PDB, {"cities": F_POPDEN}, minmax_witness=False)
        assert got["cities"].fragments < full["cities"]

    def test_min_witness_branch(self, db):
        q = Aggregate(SCAN, ("state",), (AggSpec("min", "popden", "mn"),))
        assert_capture_accurate(q, db, {"cities": F_POPDEN})

    def test_nested_aggregation(self, db):
        inner = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        q = Aggregate(Select(inner, Col("n").gt(Lit(1))), (), (AggSpec("count", None, "k"),))
        assert_capture_accurate(q, db, {"cities": F_STATE})

    def test_disjunctive_selection(self, db):
        q = Select(SCAN, Or(Col("state").eq(Lit("AK")), Col("popden").lt(Lit(2200))))
        assert_capture_accurate(q, db, {"cities": F_POPDEN})


class TestMethodsAndEncoding:
    def test_case_and_bsearch_agree(self, db):
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        a = capture_sketch(q, db, {"cities": F_POPDEN}, method="case")
        b = capture_sketch(q, db, {"cities": F_POPDEN}, method="bsearch")
        assert a["cities"].fragments == b["cities"].fragments

    def test_instrument_rejects_unknown_relation(self):
        with pytest.raises(ValueError):
            instrument(SCAN, {"nope": F_STATE})

    def test_instrument_requires_some_partition(self):
        with pytest.raises(ValueError):
            instrument(SCAN, {})

    def test_instrumented_schema(self):
        plan = instrument(Select(SCAN, Col("state").eq(Lit("CA"))), {"cities": F_STATE})
        assert plan.schema() == (ann_col("cities"),)

    def test_empty_result_empty_sketch(self, db):
        q = Select(SCAN, Col("state").eq(Lit("ZZ")))
        got = capture_sketch(q, db, {"cities": F_STATE})
        assert got["cities"].fragments == frozenset()

    def test_superset_invariant_random(self, db):
        # Def. 3: captured is always a superset of accurate lineage
        for cond in [Col("popden").gt(Lit(2000)), Col("state").ne(Lit("CA"))]:
            q = Aggregate(Select(SCAN, cond), ("state",), (AggSpec("sum", "popden", "s"),))
            got = capture_sketch(q, db, {"cities": F_POPDEN})
            exp = accurate_sketch(q, PDB, {"cities": F_POPDEN})
            assert got["cities"].fragments >= exp["cities"]
