"""A sound (not complete) validity checker for the implications the
safety (Fig. 3) and reuse (Fig. 4) rules generate.

The paper discharges these formulas with Z3 (rewriting a universally
quantified formula to a negated-existential satisfiability check). Z3
is not available in this offline environment, so this package provides
a small decision procedure specialized to the formula class the rules
actually emit: implications between conjunctions of comparison atoms
over attribute variables, with attribute-to-attribute (in)equalities
linking the primed and unprimed copies of the query.

Soundness contract: ``implies(H, C) == True`` guarantees the
implication is valid; ``False`` means "could not prove" — exactly the
behaviour the paper's sound-but-incomplete safety test requires
(Thm. 1 shows completeness is impossible anyway).
"""
from repro.solver.decide import implies  # noqa: F401
