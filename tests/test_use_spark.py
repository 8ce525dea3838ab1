"""Q[P] on Spark: result preservation, predicate shape, and the core
physical claim — injected sketch filters are pushed into Parquet scans
(the paper's "expose relevance as selection conditions the DBMS can
serve from physical design")."""
import pandas as pd
import pytest

from repro.algebra.compile_spark import compile_op
from repro.algebra.expr import And, Col, Lit, Or
from repro.algebra.ops import Aggregate, AggSpec, Select, TableAccess, TopK
from repro.algebra.to_sql import to_sql
from repro.core.ranges import RangePartition, equi_depth
from repro.core.sketch import ProvenanceSketch
from repro.core.use import apply_sketches, range_condition, sketch_predicate
from repro.oracle import assert_equivalent
from repro.physical.storage import pushed_filters, read_table, write_clustered

CITIES = pd.DataFrame(
    {
        "popden": [4200, 6000, 5000, 7000, 2000, 3700, 2500],
        "city": ["Anchorage", "San Diego", "Sacramento", "New York", "Buffalo", "Austin", "Houston"],
        "state": ["AK", "CA", "CA", "NY", "NY", "TX", "TX"],
    }
)
SCAN = TableAccess("cities", ("popden", "city", "state"))
F_STATE = RangePartition("cities", "state", ("DE", "MI", "OK"))
F_POPDEN = RangePartition("cities", "popden", (3000, 5000))


class TestPredicateConstruction:
    def test_range_condition_bounded(self):
        assert range_condition("a", 10, 20).to_sql() == "((a > 10) AND (a <= 20))"

    def test_range_condition_open_low(self):
        assert range_condition("a", None, 20).to_sql() == "(a <= 20)"

    def test_range_condition_open_high(self):
        assert range_condition("a", 10, None).to_sql() == "(a > 10)"

    def test_range_condition_unrestricted(self):
        assert range_condition("a", None, None) is None

    def test_sketch_predicate_single_fragment(self):
        sk = ProvenanceSketch(F_STATE, frozenset({0}))
        assert sketch_predicate(sk).to_sql() == "(state <= 'DE')"

    def test_sketch_predicate_adjacent_merge(self):
        # paper Sec. 8.1: {f1, f2} -> one BETWEEN-style range
        sk = ProvenanceSketch(F_STATE, frozenset({0, 1}))
        assert sketch_predicate(sk).to_sql() == "(state <= 'MI')"

    def test_sketch_predicate_disjunction(self):
        sk = ProvenanceSketch(F_STATE, frozenset({0, 2}))
        sql = sketch_predicate(sk).to_sql()
        assert "OR" in sql and "'DE'" in sql and "'MI'" in sql and "'OK'" in sql

    def test_full_sketch_no_predicate(self):
        sk = ProvenanceSketch(F_STATE, frozenset({0, 1, 2, 3}))
        assert sketch_predicate(sk) is None

    def test_empty_sketch_false_predicate(self):
        sk = ProvenanceSketch(F_STATE, frozenset())
        assert sketch_predicate(sk).to_sql() == "FALSE"


class TestRewrite:
    def q2(self):
        return TopK(
            Aggregate(SCAN, ("state",), (AggSpec("avg", "popden", "avgden"),)),
            (("avgden", False), ("state", True)),
            1,
        )

    def test_paper_q2_rewrite(self, spark):
        # paper Ex. 4: Q2[P_state] restricts to state BETWEEN AL and DE
        db = {"cities": spark.createDataFrame(CITIES)}
        sk = {"cities": ProvenanceSketch(F_STATE, frozenset({0}))}
        qp = apply_sketches(self.q2(), sk)
        assert_equivalent(compile_op(qp, db), to_sql(self.q2()), cities=CITIES)

    def test_full_sketch_identity(self):
        sk = {"cities": ProvenanceSketch(F_STATE, frozenset({0, 1, 2, 3}))}
        assert apply_sketches(self.q2(), sk) == self.q2()

    def test_multi_fragment_rewrite_result(self, spark):
        db = {"cities": spark.createDataFrame(CITIES)}
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        sk = {"cities": ProvenanceSketch(F_POPDEN, frozenset({0, 2}))}
        qp = apply_sketches(q, sk)
        out = compile_op(qp, db).toPandas()
        # fragment 1 = popden in (3000, 5000]: drops Anchorage, Sacramento, Austin
        assert set(out["state"]) == {"CA", "NY", "TX"}
        assert out.set_index("state")["n"].to_dict() == {"CA": 1, "NY": 2, "TX": 1}


class TestParquetPushdown:
    @pytest.fixture(scope="class")
    def parquet_cities(self, spark, tmp_path_factory):
        path = str(tmp_path_factory.mktemp("pq") / "cities")
        write_clustered(spark.createDataFrame(CITIES), path, "popden", n_files=2)
        return read_table(spark, path)

    def test_sketch_filter_is_pushed(self, spark, parquet_cities):
        db = {"cities": parquet_cities}
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        sk = {"cities": ProvenanceSketch(F_POPDEN, frozenset({1}))}
        df = compile_op(apply_sketches(q, sk), db)
        pushed = " ".join(pushed_filters(df))
        assert "popden" in pushed, f"sketch range not pushed to scan: {pushed}"
        assert "GreaterThan" in pushed and "LessThanOrEqual" in pushed

    def test_plain_query_no_popden_filter(self, spark, parquet_cities):
        db = {"cities": parquet_cities}
        q = Aggregate(SCAN, ("state",), (AggSpec("count", None, "n"),))
        pushed = " ".join(pushed_filters(compile_op(q, db)))
        assert "popden" not in pushed

    def test_pushed_disjunction(self, spark, parquet_cities):
        db = {"cities": parquet_cities}
        q = Select(SCAN, Col("city").ne(Lit("")))
        sk = {"cities": ProvenanceSketch(F_POPDEN, frozenset({0, 2}))}
        df = compile_op(apply_sketches(q, sk), db)
        pushed = " ".join(pushed_filters(df))
        assert "Or" in pushed and "popden" in pushed

    def test_results_equal_on_parquet(self, spark, parquet_cities):
        db = {"cities": parquet_cities}
        q = TopK(
            Aggregate(SCAN, ("state",), (AggSpec("sum", "popden", "tot"),)),
            (("tot", False), ("state", True)),
            2,
        )
        sk = {"cities": ProvenanceSketch(F_POPDEN, frozenset({0, 1, 2}))}
        a = compile_op(q, db).toPandas()
        b = compile_op(apply_sketches(q, sk), db).toPandas()
        pd.testing.assert_frame_equal(a, b)
