"""θ-subsumption tests (paper §4.2 Def. 4.4, §4.3, Thms. 4.6/4.9)."""
import pytest

from repro.core.clause import (
    Clause,
    Const,
    Literal,
    Var,
    eq_lit,
    repair_lit,
    sim_lit,
)
from repro.core.subsumption import find_substitution, reduce_clause, subsumes

x, y, z, a, b, c_ = (Var(n) for n in ["x", "y", "z", "a", "b", "c"])


def lit(pred, *args):
    return Literal(
        pred, tuple(Const(t) if isinstance(t, str) and t.islower() is False else t for t in args)
    )


def L(pred, *args):
    return Literal(pred, tuple(args))


def C(v):
    return Const(v)


class TestBasicSubsumption:
    def test_paper_section_42_example(self):
        """C1: hg(x) ← movies(x,y,z) θ-subsumes C2 with extra literal."""
        c1 = Clause(L("hg", x), (L("movies", x, y, z),))
        c2 = Clause(
            L("hg", C("a")),
            (
                L("movies", C("a"), C("b"), C("c")),
                L("mov2genres", C("b"), C("comedy")),
            ),
        )
        assert subsumes(c1, c2)
        assert not subsumes(c2, c1)

    def test_head_must_map(self):
        c1 = Clause(L("hg", x), (L("r", x),))
        c2 = Clause(L("hg", C("e")), (L("r", C("f")),))
        assert not subsumes(c1, c2)

    def test_two_literals_one_fact(self):
        # Both body literals may map onto the same ground fact.
        c1 = Clause(L("t", x), (L("r", x, y), L("r", x, z)))
        c2 = Clause(L("t", C("e")), (L("r", C("e"), C("v")),))
        assert subsumes(c1, c2)

    def test_join_must_hold(self):
        c1 = Clause(L("t", x), (L("r", x, y), L("s", y)))
        c2_ok = Clause(L("t", C("e")), (L("r", C("e"), C("k")), L("s", C("k"))))
        c2_bad = Clause(L("t", C("e")), (L("r", C("e"), C("k")), L("s", C("m"))))
        assert subsumes(c1, c2_ok)
        assert not subsumes(c1, c2_bad)

    def test_constant_anchoring(self):
        c1 = Clause(L("t", x), (L("g", x, C("drama")),))
        assert subsumes(c1, Clause(L("t", C("e")), (L("g", C("e"), C("drama")),)))
        assert not subsumes(c1, Clause(L("t", C("e")), (L("g", C("e"), C("comedy")),)))

    def test_substitution_returned(self):
        c1 = Clause(L("t", x), (L("r", x, y),))
        c2 = Clause(L("t", C("e")), (L("r", C("e"), C("v")),))
        theta = find_substitution(c1, c2)
        assert theta is not None and theta[x] == C("e") and theta[y] == C("v")

    def test_work_budget_returns_none(self):
        body1 = tuple(L("r", Var(f"u{i}"), Var(f"u{i+1}")) for i in range(12))
        facts = tuple(
            L("r", C(f"n{i}"), C(f"n{j}")) for i in range(8) for j in range(8)
        )
        c1 = Clause(L("t", Var("u0")), body1 + (L("q", Var("u12")),))
        c2 = Clause(L("t", C("n0")), facts)  # no 'q' fact -> unsatisfiable
        assert not subsumes(c1, c2, max_work=500)


class TestSimilarityLiterals:
    def test_sim_requires_ground_fact(self):
        c1 = Clause(L("t", x), (L("m", y, z), sim_lit(x, z)))
        g_ok = Clause(
            L("t", C("s")),
            (L("m", C("m1"), C("s7")), sim_lit(C("s"), C("s7"))),
        )
        g_bad = Clause(L("t", C("s")), (L("m", C("m1"), C("s7")),))
        assert subsumes(c1, g_ok)
        assert not subsumes(c1, g_bad)

    def test_sim_order_insensitive(self):
        c1 = Clause(L("t", x), (L("m", y, z), sim_lit(z, x)))
        g = Clause(
            L("t", C("s")),
            (L("m", C("m1"), C("s7")), sim_lit(C("s"), C("s7"))),
        )
        assert subsumes(c1, g)

    def test_sim_reflexive(self):
        # a ≈ a holds without an explicit fact (exact match).
        c1 = Clause(L("t", x), (L("m", y, x), sim_lit(x, x)))
        g = Clause(L("t", C("s")), (L("m", C("m1"), C("s")),))
        assert subsumes(c1, g)

    def test_eq_literal(self):
        c1 = Clause(L("t", x), (L("r", x, y), L("s", z), eq_lit(y, z)))
        g_ok = Clause(L("t", C("e")), (L("r", C("e"), C("k")), L("s", C("k"))))
        g_bad = Clause(L("t", C("e")), (L("r", C("e"), C("k")), L("s", C("m"))))
        assert subsumes(c1, g_ok)
        assert not subsumes(c1, g_bad)


def md_group(xt, tt, g, u1, u2):
    return (
        sim_lit(xt, tt),
        repair_lit(xt, u1, constraint="md:title", group=g),
        repair_lit(tt, u2, constraint="md:title", group=g),
        eq_lit(u1, u2),
    )


class TestRepairLiterals:
    def _ground(self, group="gd"):
        merged = C(("⋈", "s", "s7"))
        return Clause(
            L("t", C("s")),
            (
                L("m", C("m1"), C("s7")),
                sim_lit(C("s"), C("s7")),
                repair_lit(C("s"), merged, constraint="md:title", group=group),
                repair_lit(C("s7"), merged, constraint="md:title", group=group),
                eq_lit(merged, merged),
            ),
        )

    def test_repair_literal_maps_across_groups(self):
        u1, u2 = Var("u1"), Var("u2")
        c1 = Clause(
            L("t", x), (L("m", y, z),) + md_group(x, z, "gc", u1, u2)
        )
        # group names differ between C and G; constraint ids match
        assert subsumes(c1, self._ground())

    def test_constraint_mismatch_blocks(self):
        u1, u2 = Var("u1"), Var("u2")
        body = (L("m", y, z), sim_lit(x, z),
                repair_lit(x, u1, constraint="md:other", group="g"),
                repair_lit(z, u2, constraint="md:other", group="g"),
                eq_lit(u1, u2))
        c1 = Clause(L("t", x), body)
        assert not subsumes(c1, self._ground())

    def test_def44_condition2_blocks_constrained_term(self):
        """A clause that *joins* on the repaired value without carrying
        the repair literal does not subsume (Def. 4.4 condition 2)."""
        c1 = Clause(L("t", x), (L("m", y, x),))  # head var = title, joined
        g = Clause(
            L("t", C("s7")),
            (
                L("m", C("m1"), C("s7")),
                sim_lit(C("s"), C("s7")),
                repair_lit(C("s7"), C(("⋈", "s", "s7")), constraint="md:title", group="g"),
            ),
        )
        assert not subsumes(c1, g)

    def test_free_variable_waives_condition2(self):
        """A repaired term C touches through one free variable cannot
        break coverage — condition 2 is waived for it."""
        c1 = Clause(L("t", x), (L("p", x, y), L("m", z, y2 := Var("w"))))
        g = Clause(
            L("t", C("e")),
            (
                L("p", C("e"), C("k")),
                L("m", C("m1"), C("s7")),
                repair_lit(C("s7"), C("v"), constraint="md:title", group="g"),
            ),
        )
        assert subsumes(c1, g)


class TestReduceClause:
    def test_removes_foldable_group(self):
        y1, y2, w = Var("y1"), Var("y2"), Var("w")
        clause = Clause(
            L("t", x),
            (
                L("cast", x, y1),
                L("movies", x, z),
                L("cast", w, y1),   # folds: w -> x
                L("movies", w, Var("z2")),  # folds with it
            ),
        )
        out = reduce_clause(clause)
        assert len(out.body) == 2

    def test_keeps_constant_bearing_literal(self):
        clause = Clause(
            L("t", x),
            (
                L("cast", x, y),
                L("cast", z, y),
                L("country", z, C("USA")),
            ),
        )
        out = reduce_clause(clause)
        # 'z acts with y and is from USA' is not implied unless x is USA
        assert L("country", z, C("USA")) in out.body

    def test_keeps_sim_literal(self):
        u1, u2 = Var("u1"), Var("u2")
        clause = Clause(
            L("t", x),
            (L("m", y, z),) + md_group(x, z, "g", u1, u2),
        )
        out = reduce_clause(clause)
        assert sim_lit(x, z) in out.body

    def test_idempotent(self):
        clause = Clause(L("t", x), (L("r", x, y), L("s", y)))
        once = reduce_clause(clause)
        assert reduce_clause(once) == once
