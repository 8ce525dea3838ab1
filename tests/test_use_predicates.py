"""Unit tests for the Sec. 8.1 predicate machinery: range coarsening
and the binary-search membership test (no Spark needed)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.algebra.expr import And, Col, Lit
from repro.core.ranges import RangePartition
from repro.core.sketch import ProvenanceSketch
from repro.core.use import (
    RangeMembership,
    coarsen_ranges,
    sketch_predicate,
)

P8 = RangePartition("r", "a", (10, 20, 30, 40, 50, 60, 70))


class TestCoarsen:
    def test_within_budget_unchanged(self):
        rs = [(None, 10), (20, 30)]
        assert coarsen_ranges(rs, 4) == rs

    def test_merges_smallest_gap_first(self):
        rs = [(0, 10), (11, 20), (100, 110)]
        out = coarsen_ranges(rs, 2)
        assert out == [(0, 20), (100, 110)]

    def test_budget_one(self):
        rs = [(0, 10), (50, 60), (90, 100)]
        assert coarsen_ranges(rs, 1) == [(0, 100)]

    def test_superset_property(self):
        rs = [(0, 10), (30, 40), (40, 45), (80, 81)]
        out = coarsen_ranges(rs, 2)
        # every original range is inside some coarsened range
        for lo, hi in rs:
            assert any(
                (clo is None or clo <= lo) and (chi is None or chi >= hi)
                for clo, chi in out
            )

    def test_open_ends(self):
        rs = [(None, 10), (20, 30), (90, None)]
        out = coarsen_ranges(rs, 2)
        assert out[0][0] is None and out[-1][1] is None


class TestRangeMembership:
    RM = RangeMembership(Col("a"), ((None, 10), (20, 30), (90, None)))

    def test_eval_pandas(self):
        df = pd.DataFrame({"a": [5, 10, 11, 20, 21, 30, 31, 90, 91]})
        got = list(self.RM.eval_pandas(df))
        assert got == [True, True, False, False, True, True, False, False, True]

    def test_sql_is_full_disjunction(self):
        sql = self.RM.to_sql()
        assert "OR" in sql and "(a <= 10)" in sql and "(a > 90)" in sql

    def test_bounded_only(self):
        rm = RangeMembership(Col("a"), ((10, 20),))
        df = pd.DataFrame({"a": [10, 11, 20, 21]})
        assert list(rm.eval_pandas(df)) == [False, True, True, False]

    def test_string_ranges(self):
        rm = RangeMembership(Col("s"), (("b", "d"), ("x", None)))
        df = pd.DataFrame({"s": ["a", "b", "c", "d", "e", "y"]})
        assert list(rm.eval_pandas(df)) == [False, False, True, True, False, True]

    def test_empty_input(self):
        df = pd.DataFrame({"a": []})
        assert list(self.RM.eval_pandas(df)) == []

    @given(
        st.sets(st.integers(0, 7), min_size=1, max_size=7),
        st.lists(st.integers(-5, 90), min_size=1, max_size=50),
    )
    @settings(max_examples=100, deadline=None)
    def test_membership_matches_fragment_of(self, frags, vals):
        """Membership in the merged ranges == fragment_of in the sketch."""
        sk = ProvenanceSketch(P8, frozenset(frags))
        rm = RangeMembership(Col("a"), tuple(P8.merged_ranges(sk.fragments)))
        df = pd.DataFrame({"a": vals})
        got = list(rm.eval_pandas(df))
        exp = [P8.fragment_of(v) in frags for v in vals]
        assert got == exp


class TestHybridPredicate:
    def test_small_sketch_pure_or(self):
        sk = ProvenanceSketch(P8, frozenset({0, 2}))
        pred = sketch_predicate(sk, max_disjuncts=4)
        assert not _contains_membership(pred)

    def test_large_sketch_hybrid(self):
        sk = ProvenanceSketch(P8, frozenset({0, 2, 4, 6}))
        pred = sketch_predicate(sk, max_disjuncts=2)
        assert isinstance(pred, And)
        assert _contains_membership(pred)

    def test_hybrid_equivalent_to_exact(self):
        sk = ProvenanceSketch(P8, frozenset({0, 2, 4, 6}))
        exact = sketch_predicate(sk, max_disjuncts=100)
        hybrid = sketch_predicate(sk, max_disjuncts=2)
        df = pd.DataFrame({"a": list(range(-5, 90))})
        assert list(exact.eval_pandas(df)) == list(hybrid.eval_pandas(df))

    def test_full_coverage_none(self):
        sk = ProvenanceSketch(P8, frozenset(range(8)))
        assert sketch_predicate(sk) is None

    def test_empty_false(self):
        sk = ProvenanceSketch(P8, frozenset())
        assert sketch_predicate(sk) == Lit(False)


def _contains_membership(e) -> bool:
    if isinstance(e, RangeMembership):
        return True
    return any(_contains_membership(c) for c in e.children())
