"""Reference interpreter: results match DuckDB, lineage is exact.

The interpreter is the ground truth for sketch capture, so its own
results are cross-checked against DuckDB and its lineage against
hand-computed sets on the paper's running example.
"""
import duckdb
import pandas as pd
import pytest

from repro.algebra.expr import And, Col, Lit, Or
from repro.algebra.interp import (
    accurate_sketch,
    evaluate,
    provenance,
    result_frame,
    sketch_instance,
)
from repro.algebra.ops import (
    Aggregate,
    AggSpec,
    CrossProduct,
    Distinct,
    Join,
    Project,
    Select,
    TableAccess,
    TopK,
    Union,
)
from repro.algebra.to_sql import to_sql
from repro.core.ranges import RangePartition

CITIES = pd.DataFrame(
    {
        "popden": [4200, 6000, 5000, 7000, 2000, 3700, 2500],
        "city": ["Anchorage", "San Diego", "Sacramento", "New York", "Buffalo", "Austin", "Houston"],
        "state": ["AK", "CA", "CA", "NY", "NY", "TX", "TX"],
    }
)
DB = {"cities": CITIES}
SCAN = TableAccess("cities", ("popden", "city", "state"))
F_STATE = RangePartition("cities", "state", ("DE", "MI", "OK"))
F_POPDEN = RangePartition("cities", "popden", (4000,))


def duck(q, **tables):
    con = duckdb.connect()
    try:
        for n, t in tables.items():
            con.register(n, t)
        return con.execute(to_sql(q)).fetchdf()
    finally:
        con.close()


def same(q, db=DB):
    got = result_frame(q, db).reset_index(drop=True)
    exp = duck(q, **db).reset_index(drop=True)
    got = got[sorted(got.columns)].sort_values(sorted(got.columns)).reset_index(drop=True)
    exp = exp[sorted(exp.columns)].sort_values(sorted(exp.columns)).reset_index(drop=True)
    pd.testing.assert_frame_equal(got, exp, check_dtype=False)


class TestResultsMatchDuck:
    def test_select(self):
        same(Select(SCAN, Col("state").eq(Lit("NY"))))

    def test_project(self):
        same(Project(SCAN, ((Col("popden") * Lit(2), "p2"), (Col("state"), "state"))))

    def test_aggregate(self):
        same(Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"), AggSpec("count", None, "n"))))

    def test_aggregate_global(self):
        same(Aggregate(SCAN, (), (AggSpec("sum", "popden", "total"), AggSpec("min", "popden", "mn"))))

    def test_join(self):
        other = pd.DataFrame({"st": ["CA", "NY"], "region": ["W", "E"]})
        q = Join(SCAN, TableAccess("states", ("st", "region")), Col("state").eq(Col("st")))
        same(q, {"cities": CITIES, "states": other})

    def test_cross(self):
        other = pd.DataFrame({"k": [1, 2]})
        q = CrossProduct(SCAN, TableAccess("t", ("k",)))
        same(q, {"cities": CITIES, "t": other})

    def test_union(self):
        same(Union(Select(SCAN, Col("state").eq(Lit("CA"))), Select(SCAN, Col("popden").gt(Lit(5000)))))

    def test_distinct(self):
        same(Distinct(Project(SCAN, ((Col("state"), "state"),))))

    def test_topk(self):
        same(TopK(SCAN, (("popden", False), ("city", True)), 3))

    def test_nested_having(self):
        inner = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        same(Aggregate(Select(inner, Col("n").gt(Lit(1))), (), (AggSpec("count", None, "k"),)))

    def test_empty_selection(self):
        same(Select(SCAN, Col("state").eq(Lit("ZZ"))))


class TestLineage:
    def test_table_lineage_is_self(self):
        df = evaluate(SCAN, DB)
        assert df["__prov__"][0] == frozenset({("cities", 0)})

    def test_selection_filters_lineage(self):
        p = provenance(Select(SCAN, Col("state").eq(Lit("CA"))), DB)
        assert p == {"cities": {1, 2}}

    def test_q2_running_example(self):
        # paper Ex. 3: provenance of the top-1 avg query is {t2, t3}
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        assert provenance(q2, DB) == {"cities": {1, 2}}

    def test_aggregate_group_lineage(self):
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        df = evaluate(q, DB)
        ny = df[df["state"] == "NY"]["__prov__"].iloc[0]
        assert ny == frozenset({("cities", 3), ("cities", 4)})

    def test_join_unions_lineage(self):
        other = pd.DataFrame({"st": ["CA"]})
        q = Join(SCAN, TableAccess("states", ("st",)), Col("state").eq(Col("st")))
        p = provenance(q, {"cities": CITIES, "states": other})
        assert p == {"cities": {1, 2}, "states": {0}}

    def test_distinct_unions_duplicates(self):
        q = Distinct(Project(SCAN, ((Col("state"), "state"),)))
        df = evaluate(q, DB)
        tx = df[df["state"] == "TX"]["__prov__"].iloc[0]
        assert tx == frozenset({("cities", 5), ("cities", 6)})

    def test_minmax_witness_mode(self):
        q = Aggregate(SCAN, ("state",), (AggSpec("max", "popden", "mx"),))
        p = provenance(q, DB, minmax_witness=True)
        # one witness per state: AK->t1(0), CA->t2(1), NY->t4(3), TX->t6(5)
        assert p == {"cities": {0, 1, 3, 5}}

    def test_minmax_witness_includes_ties(self):
        df = pd.DataFrame({"g": [1, 1, 1], "v": [5, 5, 3]})
        q = Aggregate(TableAccess("t", ("g", "v")), ("g",), (AggSpec("max", "v", "mx"),))
        p = provenance(q, {"t": df}, minmax_witness=True)
        assert p == {"t": {0, 1}}

    def test_union_lineage(self):
        q = Union(
            Select(SCAN, Col("state").eq(Lit("CA"))),
            Select(SCAN, Col("popden").gt(Lit(6500))),
        )
        assert provenance(q, DB) == {"cities": {1, 2, 3}}


class TestSketchHelpers:
    def test_accurate_sketch_state(self):
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        assert accurate_sketch(q2, DB, {"cities": F_STATE})["cities"] == frozenset({0})

    def test_accurate_sketch_popden(self):
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        assert accurate_sketch(q2, DB, {"cities": F_POPDEN})["cities"] == frozenset({1})

    def test_sketch_instance_restricts(self):
        inst = sketch_instance(DB, {"cities": F_POPDEN}, {"cities": frozenset({1})})
        assert set(inst["cities"]["city"]) == {"Anchorage", "San Diego", "Sacramento", "New York"}

    def test_unsafe_popden_example(self):
        # paper Ex. 5: the popden sketch changes the answer
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        sk = accurate_sketch(q2, DB, {"cities": F_POPDEN})
        inst = sketch_instance(DB, {"cities": F_POPDEN}, sk)
        wrong = result_frame(q2, inst)
        assert wrong.iloc[0]["state"] == "NY" and wrong.iloc[0]["avgden"] == 7000

    def test_safe_state_example(self):
        q2 = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )
        sk = accurate_sketch(q2, DB, {"cities": F_STATE})
        inst = sketch_instance(DB, {"cities": F_STATE}, sk)
        pd.testing.assert_frame_equal(result_frame(q2, inst), result_frame(q2, DB))
