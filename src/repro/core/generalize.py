"""ARMG generalisation (paper §4.2, following ProGolem).

``armg(C, G)`` removes the *blocking literals* of clause C with respect
to the ground bottom clause G of another positive example, producing a
clause that θ-subsumes C (literal dropping only) and covers that
example. The scan keeps a frontier of partial substitutions (all ways
the processed prefix maps into G, up to ``max_width`` — ProGolem's own
bounded-width approximation):

* head unification seeds the frontier (no mapping → the example cannot
  be covered by any generalisation that keeps the head shape → None);
* a relation/repair literal extends every substitution against G's
  matching facts; zero extensions ⇒ the literal is *blocking* and is
  dropped, the frontier is left unchanged;
* SIM/EQ literals filter the frontier (binding a still-free side when
  the other is bound); an emptied frontier means the restriction is
  blocking — it is dropped and the frontier restored.

Finally :func:`~repro.core.clause.head_connected` removes literals
orphaned by the drops (paper: "all literals in the resulting clause are
head-connected"; repair literals whose anchor was dropped go with it).
"""
from __future__ import annotations

from repro.core.clause import (
    EQ,
    SIM,
    Clause,
    Const,
    Literal,
    Term,
    Var,
    head_connected,
    remove_redundant_literals,
)
from repro.core.subsumption import _unify_literal, reduce_clause


def _term(theta: dict[Var, Term], t: Term) -> Term:
    return theta.get(t, t) if isinstance(t, Var) else t


def armg(
    c: Clause, g: Clause, *, max_width: int = 64, full_reduce: bool = False
) -> Clause | None:
    """Asymmetric relative minimal generalisation of C w.r.t. G."""
    theta0 = _unify_literal(c.head, g.head, {})
    if theta0 is None:
        return None
    g_by_pred: dict[str, list[Literal]] = {}
    for lit in g.body:
        g_by_pred.setdefault(lit.pred, []).append(lit)
    sim_pairs = {frozenset(l.args) for l in g.body if l.pred == SIM}

    frontier: list[dict[Var, Term]] = [theta0]
    kept: list[Literal] = []
    for lit in c.body:
        if lit.pred in (SIM, EQ):
            new_frontier: list[dict[Var, Term]] = []
            for theta in frontier:
                a = _term(theta, lit.args[0])
                b = _term(theta, lit.args[1])
                a_free, b_free = isinstance(a, Var), isinstance(b, Var)
                if not a_free and not b_free:
                    if lit.pred == EQ:
                        if a == b:
                            new_frontier.append(theta)
                    else:
                        if a == b or frozenset((a, b)) in sim_pairs:
                            new_frontier.append(theta)
                elif a_free and not b_free:
                    t2 = dict(theta)
                    t2[a] = b
                    new_frontier.append(t2)
                elif b_free and not a_free:
                    t2 = dict(theta)
                    t2[b] = a
                    new_frontier.append(t2)
                else:
                    new_frontier.append(theta)  # both free: defer
            if new_frontier:
                frontier = new_frontier[:max_width]
                kept.append(lit)
            # else: blocking restriction literal -> dropped, frontier kept
        else:
            new_frontier = []
            for theta in frontier:
                for fact in g_by_pred.get(lit.pred, ()):  # type: ignore[arg-type]
                    t2 = _unify_literal(lit, fact, theta)
                    if t2 is not None:
                        new_frontier.append(t2)
                        if len(new_frontier) >= max_width:
                            break
                if len(new_frontier) >= max_width:
                    break
            if new_frontier:
                frontier = new_frontier
                kept.append(lit)
            # else: blocking literal -> dropped
    out = remove_redundant_literals(head_connected(Clause(c.head, tuple(kept))))
    # Full Plotkin reduction is O(n²) subsumption calls; ARMG inputs are
    # already reduced bottom clauses, so by default only the cheap
    # fold-onto-sibling pass runs here (the covering loop Plotkin-reduces
    # the finally selected clause).
    return reduce_clause(out) if full_reduce else out
