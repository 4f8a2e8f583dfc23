"""θ-subsumption for clauses with similarity and repair literals.

``subsumes(C, D)`` decides whether clause C θ-subsumes clause D
(Def. 4.4): there is a substitution θ with Cθ ⊆ D where repair literals
are treated as normal literals but may only map to repair literals of
the *same constraint* (the constraint id encodes the condition c), and
the head of C must map onto the head of D.

D is typically a **ground bottom clause** (all constants), in which case
this is conjunctive-query evaluation over a small canonical database; C
may itself contain variables anywhere. The solver is exact backtracking
with most-constrained-literal ordering and forward checking on built-in
literals:

* ``EQ(x, y)``      — substituted sides must be equal (or map to the
  same ground EQ fact of D, which ground clauses expose as equal
  constants anyway);
* ``SIM(x, y)``     — substituted pair must appear as a SIM literal of D
  (or be equal: ``a ≈ a`` always holds);
* ``REPAIR(x, vx)`` — must map to a REPAIR literal of D with the same
  ``constraint``.

Def. 4.4's second condition — every repair literal of D connected to a
mapped literal is itself mapped — is checked post-hoc on the found θ via
``check_connected_repairs`` (only needed when C is a candidate and D a
ground bottom clause with repair literals; see coverage.py).
"""
from __future__ import annotations

from typing import Iterator

from repro.core.clause import (
    EQ,
    REPAIR,
    SIM,
    Clause,
    Const,
    Literal,
    Term,
    Var,
)


def _unify_literal(
    pattern: Literal, fact: Literal, theta: dict[Var, Term]
) -> dict[Var, Term] | None:
    """Extend ``theta`` so that pattern·θ == fact; None if impossible."""
    if pattern.pred != fact.pred or len(pattern.args) != len(fact.args):
        return None
    if pattern.is_repair and pattern.constraint != fact.constraint:
        return None
    out = dict(theta)
    for p, f in zip(pattern.args, fact.args):
        if isinstance(p, Const):
            if p != f:
                return None
        else:
            bound = out.get(p)
            if bound is None:
                out[p] = f
            elif bound != f:
                return None
    return out


def _term(theta: dict[Var, Term], t: Term) -> Term:
    return theta.get(t, t) if isinstance(t, Var) else t


class _Solver:
    """Budgeted backtracking: ``max_work`` bounds total unification
    attempts (search effort), making a single subsumption call O(budget)
    worst-case. Exhausting the budget reports "no subsumption" — a
    sound under-approximation of coverage, in the spirit of the
    bounded-width generalisation the paper adopts from ProGolem."""

    def __init__(self, c: Clause, d: Clause, *, max_work: int = 60_000):
        self.c = c
        self.d = d
        self.max_work = max_work
        self._work = 0
        self.d_by_pred: dict[str, list[Literal]] = {}
        for lit in d.body:
            self.d_by_pred.setdefault(lit.pred, []).append(lit)
        # SIM facts as an order-insensitive set of substituted pairs.
        self.sim_pairs: set[frozenset] = set()
        for lit in d.body:
            if lit.pred == SIM:
                self.sim_pairs.add(frozenset(lit.args))
        self.eq_pairs: set[frozenset] = {
            frozenset(l.args) for l in d.body if l.pred == EQ
        }

    def solutions(self) -> Iterator[dict[Var, Term]]:
        theta0 = _unify_literal(self.c.head, self.d.head, {})
        if theta0 is None:
            return
        rel = [l for l in self.c.body if l.pred not in (SIM, EQ)]
        constraints = [l for l in self.c.body if l.pred in (SIM, EQ)]
        yield from self._search(rel, constraints, theta0)

    def _check_constraints(
        self, constraints: list[Literal], theta: dict[Var, Term]
    ) -> tuple[list[Literal], bool]:
        """Evaluate fully-bound constraint literals; return (pending, ok).

        A pattern term is *bound* when it is a constant or already in θ —
        a θ-image that happens to be a variable of D is still bound (D's
        variables are frozen terms of its own universe; this matters for
        clause-to-clause subsumption, e.g. Plotkin reduction)."""
        pending: list[Literal] = []
        for lit in constraints:
            a = _term(theta, lit.args[0])
            b = _term(theta, lit.args[1])
            a_bound = not isinstance(lit.args[0], Var) or lit.args[0] in theta
            b_bound = not isinstance(lit.args[1], Var) or lit.args[1] in theta
            if a_bound and b_bound:
                if lit.pred == EQ:
                    if a != b and frozenset((a, b)) not in self.eq_pairs:
                        return [], False
                else:  # SIM
                    if a != b and frozenset((a, b)) not in self.sim_pairs:
                        return [], False
            else:
                pending.append(lit)
        return pending, True

    def _search(
        self,
        remaining: list[Literal],
        constraints: list[Literal],
        theta: dict[Var, Term],
    ) -> Iterator[dict[Var, Term]]:
        if self._work > self.max_work:
            return
        constraints, ok = self._check_constraints(constraints, theta)
        if not ok:
            return
        if not remaining:
            if constraints:
                # Unbound vars left only in constraints: they are
                # unconstrained elsewhere, treat reflexively satisfiable
                # EQ/SIM (x ≈ x) by binding free side to the bound side.
                theta2 = dict(theta)
                for lit in constraints:
                    a, b = lit.args
                    a_free = isinstance(a, Var) and a not in theta2
                    b_free = isinstance(b, Var) and b not in theta2
                    if a_free and not b_free:
                        theta2[a] = _term(theta2, b)
                    elif b_free and not a_free:
                        theta2[b] = _term(theta2, a)
                    elif a_free and b_free:
                        theta2[a] = b  # both free: tie together
                _, ok2 = self._check_constraints(constraints, theta2)
                if not ok2:
                    return
                yield theta2
                return
            yield theta
            return
        # Dynamic most-constrained-literal selection with fail-first
        # pruning: pick the literal with the fewest facts unifiable
        # under the current θ; a literal with zero candidates makes the
        # whole branch dead, so bail out immediately.
        best_i = -1
        best_cands: list[dict[Var, Term]] | None = None
        for i, lit in enumerate(remaining):
            cands = []
            for fact in self.d_by_pred.get(lit.pred, ()):
                self._work += 1
                t2 = _unify_literal(lit, fact, theta)
                if t2 is not None:
                    cands.append(t2)
                    if best_cands is not None and len(cands) >= len(best_cands):
                        break  # cannot beat the incumbent
            if best_cands is None or len(cands) < len(best_cands):
                best_i, best_cands = i, cands
                if not cands:
                    return  # dead end
                if len(cands) == 1:
                    break  # cannot do better than a forced choice
        rest = remaining[:best_i] + remaining[best_i + 1 :]
        for theta2 in best_cands or ():
            yield from self._search(rest, constraints, theta2)


def find_substitution(
    c: Clause, d: Clause, *, max_work: int = 60_000
) -> dict[Var, Term] | None:
    """First θ with Cθ ⊆ D and head(C)θ = head(D); None if none exists."""
    for theta in _Solver(c, d, max_work=max_work).solutions():
        if _connected_repairs_ok(c, d, theta):
            return theta
    return None


def subsumes(c: Clause, d: Clause, *, max_work: int = 60_000) -> bool:
    """True iff C θ-subsumes D per Def. 4.4."""
    return find_substitution(c, d, max_work=max_work) is not None


def reduce_clause(clause: Clause, *, max_work: int = 20_000) -> Clause:
    """Plotkin reduction: drop body literals whose removal keeps the
    clause θ-equivalent.

    ``C \\ {L}`` always subsumes ``C`` (literal dropping); removal is
    equivalence-preserving iff ``C`` also θ-subsumes ``C \\ {L}``
    (with the head fixed). Bottom clauses accumulate literal groups
    that *fold* onto the seed example's own tuples (the other movies of
    a shared actor, and their genre/country satellites); reduction
    collapses them, which both sharpens the hypothesis and keeps later
    subsumption calls cheap. The subsumption test is budgeted, so
    reduction is conservative: an exhausted budget keeps the literal.
    """
    body = list(clause.body)
    changed = True
    while changed:
        changed = False
        for i in range(len(body) - 1, -1, -1):
            cand = Clause(clause.head, tuple(body[:i] + body[i + 1 :]))
            full = Clause(clause.head, tuple(body))
            if subsumes(full, cand, max_work=max_work):
                body = list(cand.body)
                changed = True
    return Clause(clause.head, tuple(body))


def _connected_repairs_ok(
    c: Clause, d: Clause, theta: dict[Var, Term]
) -> bool:
    """Def. 4.4 condition 2.

    Every repair literal of D *connected to a mapped literal* must be the
    image of some repair literal of C. We approximate "connected" by
    first-argument overlap: repair literal ``V(x, vx)`` of D is connected
    to a mapped literal L iff x occurs in L's image. Mapped images are
    Cθ's non-repair literals; images of C's repair literals are the
    mapped repair set.
    """
    c_repairs = [l for l in c.body if l.is_repair]
    d_repairs = [l for l in d.body if l.is_repair]
    if not d_repairs:
        return True
    # A repair of D can only break coverage where C *constrains* the
    # repaired term: the image of a constant of C, or of a variable with
    # more than one occurrence (a join / similarity link). A term that C
    # touches through one free variable is repair-agnostic — any rename
    # keeps the mapping valid — so no corresponding repair literal is
    # demanded for it (Def. 4.4 restricted to load-bearing terms).
    occ: dict[Term, int] = {}
    non_repair = [c.head] + [l for l in c.body if not l.is_repair]
    for lit in non_repair:
        for a in lit.args:
            occ[a] = occ.get(a, 0) + 1
    constrained_images: set[Term] = set()
    for lit in non_repair:
        img = lit.substitute(theta)
        for a, ia in zip(lit.args, img.args):
            if isinstance(a, Const) or occ.get(a, 0) >= 2:
                constrained_images.add(ia)
    # Group/alt are per-clause bookkeeping; Def. 4.4 identifies repair
    # literals by their condition (constraint) and arguments.
    mapped_repair_keys = {
        (l.constraint, l.substitute(theta).args) for l in c_repairs
    }
    for dr in d_repairs:
        x = dr.args[0]
        if x not in constrained_images:
            continue  # not connected to a load-bearing mapped term
        if (dr.constraint, dr.args) in mapped_repair_keys:
            continue
        # The violation may be accounted for by a sibling alternative of
        # the same constraint repairing the same term.
        if any(
            k[0] == dr.constraint and k[1] and k[1][0] == x
            for k in mapped_repair_keys
        ):
            continue
        return False
    return True
