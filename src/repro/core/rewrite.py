"""EG-rewritings (paper Definition 17) and minDatalog (Definition 19).

A node's EG-rewriting unfolds its rule's intensional body atoms through
the node's parents, down to extensional atoms.  In this reproduction a TG
node's body position is fed by a *group* of parent nodes (DESIGN.md §3),
so the rewriting is a union of CQs (UCQ); containment between UCQs is
tested disjunct-wise (Sagiv–Yannakakis) with Chandra–Merlin homomorphism
checks from :mod:`repro.core.unify`.

Expansion is capped (#disjuncts / #atoms); a capped rewriting returns
``None`` and the node is simply not considered for elimination — caps
trade optimality for bounded planning time, never correctness.
"""
from __future__ import annotations

import itertools

from .eg import EGNode
from .rules import Atom, Rule
from .terms import is_var
from .unify import CQ, apply_sub, mgu, ucq_contained

_rename_counter = itertools.count()


def _standardize(rule: Rule) -> Rule:
    """Rename a rule's variables apart (Def. 17 assumes no sharing)."""
    tag = next(_rename_counter)
    ren = {v: f"{v}ʹ{tag}" for a in (*rule.body, rule.head) for v in a.vars}
    return Rule(
        body=tuple(Atom(a.pred, tuple(ren.get(t, t) for t in a.args)) for a in rule.body),
        head=Atom(rule.head.pred, tuple(ren.get(t, t) for t in rule.head.args)),
        rid=rule.rid,
    )


def eg_rewriting(
    node: EGNode,
    *,
    max_disjuncts: int = 48,
    max_atoms: int = 12,
) -> list[CQ] | None:
    """rew(node) as a UCQ over extensional atoms, or None if capped.

    A worklist of partial CQs; each entry annotates every intensional atom
    with the parent group feeding it.  The rewriting step unifies the atom
    with each parent's (standardized-apart) head and substitutes that
    parent's body — one new disjunct per parent in the group.
    """
    # annotation per body atom: parent group (list) for intensional atoms
    # (possibly empty => unsatisfiable disjunct), None for extensional ones
    r0 = _standardize(node.rule)
    start = (
        tuple(r0.head.args),
        [(a, node.parents.get(j)) for j, a in enumerate(r0.body)],
    )
    done: list[CQ] = []
    work = [start]
    while work:
        head, annotated = work.pop()
        idx = next(
            (i for i, (_, grp) in enumerate(annotated) if grp is not None), None
        )
        if idx is None:
            done.append(CQ(tuple(head), tuple(a for a, _ in annotated)))
            if len(done) > max_disjuncts:
                return None
            continue
        atom, group = annotated[idx]
        # empty feeding group: this disjunct's source is empty — drop it
        for parent in group:
            pr = _standardize(parent.rule)
            theta = mgu(pr.head, atom)
            if theta is None:
                continue
            new_ann = (
                [(apply_sub(a, theta), g) for a, g in annotated[:idx]]
                + [
                    (apply_sub(a, theta), parent.parents.get(j))
                    for j, a in enumerate(pr.body)
                ]
                + [(apply_sub(a, theta), g) for a, g in annotated[idx + 1 :]]
            )
            if len(new_ann) > max_atoms:
                return None
            new_head = tuple(theta.get(t, t) if is_var(t) else t for t in head)
            work.append((new_head, new_ann))
            if len(work) + len(done) > 4 * max_disjuncts:
                return None
    return done


def find_dominating(
    candidate: EGNode,
    kept: list[EGNode],
    rewritings: dict[int, list[CQ] | None],
) -> EGNode | None:
    """minDatalog (Def. 19) test: a kept node u with the same head
    predicate, depth(u) <= depth(candidate), and rew(candidate) ⊆ rew(u).
    ``rewritings`` caches rew() by node id (None = capped, skip)."""
    rv = rewritings.get(candidate.nid)
    if rv is None:
        return None
    for u in kept:
        if u.nid == candidate.nid or u.depth > candidate.depth:
            continue
        if u.rule.head.pred != candidate.rule.head.pred:
            continue
        ru = rewritings.get(u.nid)
        if ru is None:
            continue
        if ucq_contained(rv, ru):
            return u
    return None
