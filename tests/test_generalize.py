"""ARMG generalisation tests (paper §4.2, Example 4.7)."""
import pytest

from repro.core.clause import Clause, Const, Literal, Var, head_connected
from repro.core.generalize import armg
from repro.core.subsumption import subsumes

from tests._movie_fixture import bc, make_db

x, y = Var("x"), Var("y")


def L(pred, *args):
    return Literal(pred, tuple(args))


class TestExample47:
    """Generalising Superbad's bottom clause to cover Zoolander drops
    the blocking literals (August release / USA country differences are
    absorbed; comedy is shared)."""

    def setup_method(self):
        self.db = make_db()
        self.cur = head_connected(bc(self.db, ("Superbad",)))
        self.gz = bc(self.db, ("Zoolander",), ground=True)
        self.gs = bc(self.db, ("Superbad",), ground=True)
        self.go = bc(self.db, ("Orphanage",), ground=True)

    def test_covers_both_comedies(self):
        g = armg(self.cur, self.gz)
        assert subsumes(g, self.gs)
        assert subsumes(g, self.gz)

    def test_does_not_cover_drama(self):
        g = armg(self.cur, self.gz)
        assert not subsumes(g, self.go)

    def test_blocking_month_dropped(self):
        g = armg(self.cur, self.gz)
        months = [l for l in g.body if l.pred == "mov2releasedate"]
        # Superbad: August, Zoolander: September -> constant is blocking
        assert all(Const("August") not in l.args for l in months)

    def test_comedy_kept(self):
        g = armg(self.cur, self.gz)
        assert any(
            l.pred == "mov2genres" and Const("comedy") in l.args for l in g.body
        )

    def test_result_subsumed_by_nothing_lost(self):
        """ARMG only drops literals: the result θ-subsumes the input's
        coverage direction (more general)."""
        g = armg(self.cur, self.gz)
        assert len(g.body) <= len(self.cur.body)

    def test_sim_and_repairs_survive(self):
        g = armg(self.cur, self.gz)
        assert any(l.pred == "__sim__" for l in g.body)
        assert any(l.is_repair for l in g.body)

    def test_generalize_to_incompatible_head_returns_none(self):
        cur = Clause(
            L("t", Const("fixed")), (L("r", Const("fixed"), y),)
        )
        g = Clause(L("t", Const("other")), (L("r", Const("other"), Const("v")),))
        assert armg(cur, g) is None


class TestArmgMechanics:
    def test_drops_unmatchable_literal(self):
        cur = Clause(L("t", x), (L("r", x, y), L("q", y)))
        g = Clause(L("t", Const("e")), (L("r", Const("e"), Const("k")),))
        out = armg(cur, g)
        assert L("q", y) not in out.body
        assert subsumes(out, g)

    def test_keeps_everything_when_covering(self):
        cur = Clause(L("t", x), (L("r", x, y),))
        g = Clause(L("t", Const("e")), (L("r", Const("e"), Const("k")),))
        out = armg(cur, g)
        assert out.body == cur.body

    def test_constant_blocking(self):
        cur = Clause(L("t", x), (L("g", x, Const("drama")),))
        g = Clause(L("t", Const("e")), (L("g", Const("e"), Const("comedy")),))
        out = armg(cur, g)
        assert out.body == ()
