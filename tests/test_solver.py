"""The implication checker standing in for the paper's SMT solver.

Soundness is the contract: every True here must be a valid
implication; the *_unprovable tests pin cases that must stay False
(either invalid, or out of the sound fragment).
"""
from repro.algebra.expr import And, BinOp, Cmp, Col, Lit, Not, Or
from repro.solver import implies
from repro.solver.decide import linearize


def c(name):
    return Col(name)


class TestBasicBounds:
    def test_tautology(self):
        assert implies([], [Lit(True)])

    def test_direct_atom(self):
        assert implies([c("a").gt(Lit(5))], [c("a").gt(Lit(5))])

    def test_weaker_bound(self):
        assert implies([c("a").gt(Lit(10))], [c("a").gt(Lit(5))])

    def test_strict_from_nonstrict_fails(self):
        assert not implies([c("a").ge(Lit(5))], [c("a").gt(Lit(5))])

    def test_nonstrict_from_strict(self):
        assert implies([c("a").gt(Lit(5))], [c("a").ge(Lit(5))])

    def test_upper_bound(self):
        assert implies([c("a").lt(Lit(3))], [c("a").le(Lit(10))])

    def test_equality_gives_bounds(self):
        assert implies([c("a").eq(Lit(7))], [c("a").ge(Lit(7)), c("a").le(Lit(7))])

    def test_invalid_rejected(self):
        assert not implies([c("a").gt(Lit(5))], [c("a").gt(Lit(10))])

    def test_string_bounds(self):
        assert implies([c("s").ge(Lit("CA"))], [c("s").gt(Lit("AA"))])

    def test_mixed_types_unprovable(self):
        assert not implies([c("s").ge(Lit("CA"))], [c("s").ge(Lit(3))])

    def test_neq_from_bounds(self):
        assert implies([c("a").gt(Lit(5))], [c("a").ne(Lit(3))])


class TestEqualityClosure:
    def test_var_equality_symmetric(self):
        assert implies([c("a").eq(c("b"))], [c("b").eq(c("a"))])

    def test_transitive_chain(self):
        hyp = [c("a").eq(c("b")), c("b").eq(c("d"))]
        assert implies(hyp, [c("a").eq(c("d"))])

    def test_bounds_through_equality(self):
        hyp = [c("a").eq(c("b")), c("a").gt(Lit(10))]
        assert implies(hyp, [c("b").gt(Lit(5))])

    def test_join_chain_proves_group_equality(self):
        # the x = g via join-condition pattern from the safety rules
        hyp = [c("l_orderkey").eq(c("o_orderkey"))]
        assert implies(hyp, [c("l_orderkey").eq(c("o_orderkey"))])

    def test_primed_chain(self):
        # g = j, j = j' (Psi), j' = g'  =>  g = g'
        hyp = [c("g").eq(c("j")), c("j").eq(c("j__p")), c("j__p").eq(c("g__p"))]
        assert implies(hyp, [c("g").eq(c("g__p"))])


class TestOrderGraph:
    def test_le_chain(self):
        hyp = [c("a").le(c("b")), c("b").le(c("d"))]
        assert implies(hyp, [c("a").le(c("d"))])

    def test_strict_propagates(self):
        hyp = [c("a").lt(c("b")), c("b").le(c("d"))]
        assert implies(hyp, [c("a").lt(c("d"))])

    def test_nonstrict_chain_not_strict(self):
        hyp = [c("a").le(c("b"))]
        assert not implies(hyp, [c("a").lt(c("b"))])

    def test_monotone_aggregate_pattern(self):
        # cnt <= cnt' AND cnt > 10  =>  cnt' > 10 (safe HAVING direction)
        hyp = [c("cnt").le(c("cnt__p")), c("cnt").gt(Lit(10))]
        assert implies(hyp, [c("cnt__p").gt(Lit(10))])

    def test_antimonotone_direction_fails(self):
        # cnt <= cnt' AND cnt < 10 does NOT give cnt' < 10 (unsafe)
        hyp = [c("cnt").le(c("cnt__p")), c("cnt").lt(Lit(10))]
        assert not implies(hyp, [c("cnt__p").lt(Lit(10))])

    def test_ge_atoms_flip(self):
        hyp = [Cmp(">=", c("b"), c("b__p")), c("b__p").gt(Lit(15))]
        assert implies(hyp, [c("b").gt(Lit(10))])


class TestUcondsExamples:
    def test_paper_example7(self):
        # cnt = cnt' AND p = p' AND p' > 100 AND cnt' > 15 => p > 100 AND cnt > 10
        hyp = [
            c("cnt").eq(c("cnt__p")),
            c("p").eq(c("p__p")),
            c("p__p").gt(Lit(100)),
            c("cnt__p").gt(Lit(15)),
        ]
        assert implies(hyp, [c("p").gt(Lit(100)), c("cnt").gt(Lit(10))])

    def test_example7_reversed_fails(self):
        # sketch for cnt > 15 cannot answer cnt > 10
        hyp = [c("cnt").eq(c("cnt__p")), c("cnt__p").gt(Lit(10))]
        assert not implies(hyp, [c("cnt").gt(Lit(15))])

    def test_spread_selections(self):
        # a = a' AND a' = 20 AND a' > 10  =>  a = 20 AND a > 30 is invalid...
        hyp = [c("a").eq(c("a__p")), c("a__p").eq(Lit(20)), c("a__p").gt(Lit(10))]
        assert not implies(hyp, [c("a").gt(Lit(30))])
        # ...but => a = 20 holds
        assert implies(hyp, [c("a").eq(Lit(20))])

    def test_interval_containment(self):
        hyp = [
            c("n").eq(c("n__p")),
            c("n__p").ge(Lit(45)),
            c("n__p").le(Lit(55)),
        ]
        assert implies(hyp, [c("n").ge(Lit(40)), c("n").le(Lit(60))])
        assert not implies(hyp, [c("n").ge(Lit(50))])


class TestDefinitionsAndArith:
    def test_projection_equation(self):
        # x = a + b, a = a', b = b', x' = a' + b'  =>  x = x'
        hyp = [
            Cmp("=", BinOp("+", c("a"), c("b")), c("x")),
            c("a").eq(c("a__p")),
            c("b").eq(c("b__p")),
            Cmp("=", BinOp("+", c("a__p"), c("b__p")), c("x__p")),
        ]
        assert implies(hyp, [c("x").eq(c("x__p"))])

    def test_nonlinear_positive_product(self):
        # price in [900, 90900], disc in [0, 0.1] => price*(1-disc) >= 0
        hyp = [
            c("price").ge(Lit(900.0)),
            c("price").le(Lit(90900.0)),
            c("disc").ge(Lit(0.0)),
            c("disc").le(Lit(0.1)),
            Cmp("=", BinOp("*", c("price"), BinOp("-", Lit(1.0), c("disc"))), c("rev")),
        ]
        assert implies(hyp, [c("rev").ge(Lit(0.0))])

    def test_nonlinear_sign_unknown(self):
        hyp = [Cmp("=", BinOp("*", c("u"), c("v")), c("w"))]
        assert not implies(hyp, [c("w").ge(Lit(0.0))])

    def test_linear_single_var(self):
        hyp = [c("a").gt(Lit(5))]
        # 2a - 4 > 0 follows from a > 5 (threshold 2)
        assert implies(hyp, [Cmp(">", BinOp("-", BinOp("*", Lit(2), c("a")), Lit(4)), Lit(0))])

    def test_linearize(self):
        lin = linearize(BinOp("-", BinOp("*", Lit(2), c("a")), c("b")))
        assert lin == ({"a": 2.0, "b": -1.0}, 0.0)

    def test_linearize_nonlinear_none(self):
        assert linearize(BinOp("*", c("a"), c("b"))) is None


class TestConnectives:
    def test_and_conclusion(self):
        hyp = [c("a").gt(Lit(5))]
        assert implies(hyp, And(c("a").gt(Lit(1)), c("a").ge(Lit(5))))

    def test_or_conclusion_one_branch(self):
        hyp = [c("a").gt(Lit(5))]
        assert implies(hyp, Or(c("a").gt(Lit(100)), c("a").gt(Lit(2))))

    def test_or_hypothesis_dropped_soundly(self):
        # Or in the hypothesis cannot be used (sound weakening)
        hyp = [Or(c("a").gt(Lit(5)), c("a").lt(Lit(-5)))]
        assert not implies(hyp, [c("a").ne(Lit(0))])

    def test_not_conclusion_unprovable(self):
        assert not implies([c("a").gt(Lit(5))], Not(c("a").le(Lit(5))))

    def test_reflexive_expr_equality(self):
        e = BinOp("*", c("a"), c("b"))
        assert implies([], [Cmp("=", e, e)])
