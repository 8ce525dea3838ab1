"""IR -> Spark compilation, checked operator-by-operator against the
DuckDB oracle (repro.oracle.assert_equivalent)."""
import pandas as pd
import pytest

from repro.algebra.compile_spark import compile_op
from repro.algebra.expr import And, Col, Lit, Or
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
from repro.oracle import assert_equivalent

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


@pytest.fixture(scope="module")
def db(spark):
    return {
        "cities": spark.createDataFrame(CITIES),
        "states": spark.createDataFrame(STATES),
    }


def check(q, db, **pdb):
    tables = pdb or {"cities": CITIES, "states": STATES}
    assert_equivalent(compile_op(q, db), to_sql(q), **tables)


class TestOperators:
    def test_table_access(self, db):
        check(SCAN, db)

    def test_select(self, db):
        check(Select(SCAN, Col("popden").gt(Lit(3000))), db)

    def test_select_disjunction(self, db):
        check(Select(SCAN, Or(Col("state").eq(Lit("CA")), Col("popden").lt(Lit(2500)))), db)

    def test_project_exprs(self, db):
        check(
            Project(SCAN, ((Col("popden") * Lit(2) + Lit(1), "p"), (Col("state"), "state"))),
            db,
        )

    def test_aggregate_grouped(self, db):
        check(
            Aggregate(
                SCAN,
                ("state",),
                (
                    AggSpec("sum", "popden", "s"),
                    AggSpec("avg", "popden", "m"),
                    AggSpec("min", "popden", "lo"),
                    AggSpec("max", "popden", "hi"),
                    AggSpec("count", None, "n"),
                ),
            ),
            db,
        )

    def test_aggregate_global(self, db):
        check(Aggregate(SCAN, (), (AggSpec("sum", "popden", "s"), AggSpec("count", None, "n"))), db)

    def test_join(self, db):
        check(Join(SCAN, SSCAN, Col("state").eq(Col("st"))), db)

    def test_join_residual_condition(self, db):
        check(
            Join(SCAN, SSCAN, And(Col("state").eq(Col("st")), Col("popden").gt(Lit(2100)))),
            db,
        )

    def test_cross_product(self, db):
        check(CrossProduct(Select(SCAN, Col("state").eq(Lit("CA"))), SSCAN), db)

    def test_union_bag_semantics(self, db):
        check(
            Union(
                Select(SCAN, Col("state").eq(Lit("CA"))),
                Select(SCAN, Col("popden").gt(Lit(4000))),
            ),
            db,
        )

    def test_distinct(self, db):
        check(Distinct(Project(SCAN, ((Col("state"), "state"),))), db)

    def test_topk(self, db):
        check(TopK(SCAN, (("popden", False), ("city", True)), 3), db)

    def test_nested_having(self, db):
        inner = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        check(Aggregate(Select(inner, Col("n").gt(Lit(1))), (), (AggSpec("count", None, "k"),)), db)

    def test_topk_over_join_agg(self, db):
        j = Join(SCAN, SSCAN, Col("state").eq(Col("st")))
        agg = Aggregate(j, ("region",), (AggSpec("sum", "popden", "tot"),))
        check(TopK(agg, (("tot", False), ("region", True)), 2), db)
