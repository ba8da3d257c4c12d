"""Unification, homomorphisms and conjunctive-query containment.

These run driver-side on *small* structures only: canonical single-fact
instances (Algorithm 1 / minLinear), EG-rewritings (minDatalog), and test
fixtures.  The distributed reasoning path never calls into this module.

Facts are ``(pred, (t1, ..., tn))`` tuples of ground strings.
A CQ is ``CQ(head_vars, body_atoms)``; a UCQ is a list of CQs.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass

from .rules import Atom
from .terms import is_const, is_var

Fact = tuple[str, tuple[str, ...]]


@dataclass(frozen=True)
class CQ:
    """Conjunctive query ``Q(head) <- body``; head entries are variables
    (or constants, which is allowed and treated positionally)."""

    head: tuple[str, ...]
    body: tuple[Atom, ...]

    def __str__(self) -> str:
        return f"Q({','.join(self.head)}) <- {' & '.join(map(str, self.body))}"


# ---------------------------------------------------------------- MGU

def mgu(a1: Atom, a2: Atom) -> dict[str, str] | None:
    """Most general unifier of two atoms (None if they do not unify).

    Ground non-variable terms unify only with themselves or variables.
    Returned as an idempotent substitution over variables.
    """
    if a1.pred != a2.pred or a1.arity != a2.arity:
        return None
    sub: dict[str, str] = {}

    def walk(t: str) -> str:
        while is_var(t) and t in sub:
            t = sub[t]
        return t

    for s, t in zip(a1.args, a2.args):
        s, t = walk(s), walk(t)
        if s == t:
            continue
        if is_var(s):
            sub[s] = t
        elif is_var(t):
            sub[t] = s
        else:
            return None
    # resolve chains so the result is idempotent
    return {v: walk(v) for v in sub}


def apply_sub(atom: Atom, sub: dict[str, str]) -> Atom:
    return Atom(atom.pred, tuple(sub.get(a, a) for a in atom.args))


# ------------------------------------------------- homomorphisms (triggers)

def _index(facts: set[Fact] | list[Fact]) -> dict[str, list[tuple[str, ...]]]:
    idx: dict[str, list[tuple[str, ...]]] = {}
    for p, args in facts:
        idx.setdefault(p, []).append(args)
    return idx


def homomorphisms(
    atoms: tuple[Atom, ...],
    facts,
    seed: dict[str, str] | None = None,
) -> list[dict[str, str]]:
    """All substitutions of the atoms' variables into ground terms such
    that every instantiated atom is a fact — i.e. all triggers of a body
    in a small instance.  Backtracking over a per-predicate index."""
    idx = _index(facts)
    out: list[dict[str, str]] = []

    def extend(i: int, sub: dict[str, str]) -> None:
        if i == len(atoms):
            out.append(dict(sub))
            return
        a = atoms[i]
        for tup in idx.get(a.pred, ()):  # candidate facts
            local: dict[str, str] = {}
            ok = True
            for t, g in zip(a.args, tup):
                if is_var(t):
                    bound = sub.get(t, local.get(t))
                    if bound is None:
                        local[t] = g
                    elif bound != g:
                        ok = False
                        break
                elif t != g:
                    ok = False
                    break
            if ok:
                sub.update(local)
                extend(i + 1, sub)
                for k in local:
                    del sub[k]

    extend(0, dict(seed or {}))
    return out


def fact_homomorphism(
    src: set[Fact], dst: set[Fact], fixed: frozenset[str] = frozenset()
) -> dict[str, str] | None:
    """A homomorphism from fact set ``src`` into ``dst``: constants map to
    themselves, nulls map to any ground term — except nulls in ``fixed``,
    which must map to themselves (paper Def. 12 "preserving").  Returns one
    witness mapping over the nulls of ``src``, or None."""
    idx = _index(dst)
    src_l = sorted(src)

    def extend(i: int, m: dict[str, str]) -> dict[str, str] | None:
        if i == len(src_l):
            return dict(m)
        p, args = src_l[i]
        for tup in idx.get(p, ()):  # try to map fact i onto tup
            local: dict[str, str] = {}
            ok = True
            for t, g in zip(args, tup):
                if is_const(t) or t in fixed:
                    if t != g:
                        ok = False
                        break
                else:  # movable null
                    bound = m.get(t, local.get(t))
                    if bound is None:
                        local[t] = g
                    elif bound != g:
                        ok = False
                        break
            if ok:
                m.update(local)
                if (res := extend(i + 1, m)) is not None:
                    return res
                for k in local:
                    del m[k]
        return None

    return extend(0, {})


def instances_equivalent(a: set[Fact], b: set[Fact]) -> bool:
    """Logical equivalence of two fact sets (homomorphisms both ways)."""
    return (
        fact_homomorphism(a, b) is not None and fact_homomorphism(b, a) is not None
    )


def entails(a: set[Fact], b: set[Fact]) -> bool:
    """a |= b : homomorphism from b into a."""
    return fact_homomorphism(b, a) is not None


# ---------------------------------------------------- CQ/UCQ containment

_freeze_counter = itertools.count()


def cq_contained(q1: CQ, q2: CQ) -> bool:
    """Chandra–Merlin: Q1 ⊆ Q2 iff Q2 maps into Q1's frozen canonical
    database producing Q1's frozen head."""
    if len(q1.head) != len(q2.head):
        return False
    tag = next(_freeze_counter)
    frozen = {
        v: f"⟨{tag}:{v}⟩" for a in q1.body for v in a.vars
    } | {v: f"⟨{tag}:{v}⟩" for v in q1.head if is_var(v)}
    canon = [(a.pred, tuple(frozen.get(t, t) for t in a.args)) for a in q1.body]
    target = tuple(frozen.get(t, t) for t in q1.head)
    for h in homomorphisms(q2.body, canon):
        if tuple(h.get(t, t) for t in q2.head) == target:
            return True
    return False


def ucq_contained(u1: list[CQ], u2: list[CQ]) -> bool:
    """Sagiv–Yannakakis: U1 ⊆ U2 iff every disjunct of U1 is contained in
    some disjunct of U2."""
    return all(any(cq_contained(q1, q2) for q2 in u2) for q1 in u1)
