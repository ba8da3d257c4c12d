"""Driver-side chase over tiny instances (paper Section 3).

This is the reference implementation the distributed engines are tested
against, and the substrate of Algorithm 1 (``tglinear`` chases each
canonical fact of H(P) and reads off the chase graph).  Variants:

- ``restricted``: a trigger fires only if no extension of it maps the head
  into the current instance (homomorphism check; the VLog default);
- ``skolem``: existentials become deterministic skolem terms, facts are
  added under set semantics (the RDFox/COM default);
- for Datalog programs all variants coincide (paper Section 3).

Instances here are Python sets of ``(pred, args)`` tuples — never use this
on real data; the Spark engines live in ``repro.engine``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .rules import Program, Rule
from .terms import fresh_null, skolem
from .unify import Fact, homomorphisms


@dataclass
class ChaseEdge:
    """chaseGraph edge: ``src_facts -> (rule) -> derived`` (paper Sec. 3)."""

    src: tuple[Fact, ...]
    rule: Rule
    derived: Fact
    round: int


@dataclass
class ChaseResult:
    facts: set[Fact]
    rounds: int
    edges: list[ChaseEdge] = field(default_factory=list)
    triggers: int = 0


def _instantiate_head(rule: Rule, h: dict[str, str], variant: str) -> Fact:
    """h_s(head(r)): extend the trigger with fresh nulls (restricted) or
    skolem terms (skolem) for the existential variables."""
    ext = dict(h)
    if rule.existentials:
        frontier_vals = tuple(h[v] for v in rule.frontier)
        for z in rule.existentials:
            ext[z] = (
                skolem(rule.rid, z, frontier_vals)
                if variant == "skolem"
                else fresh_null()
            )
    return (rule.head.pred, tuple(ext.get(t, t) for t in rule.head.args))


def _head_satisfied(rule: Rule, h: dict[str, str], facts: set[Fact]) -> bool:
    """Restricted-chase check: does some extension of h map head(r) into
    the instance?  Single-atom heads -> a direct pattern match."""
    pred = rule.head.pred
    frontier = {v: h[v] for v in rule.frontier}
    for p, args in facts:
        if p != pred:
            continue
        bound: dict[str, str] = dict(frontier)
        ok = True
        for t, g in zip(rule.head.args, args):
            if t in bound:
                if bound[t] != g:
                    ok = False
                    break
            elif t in rule.existentials:
                bound[t] = g
            elif t != g:  # constant in head
                ok = False
                break
        if ok:
            return True
    return False


def chase(
    program: Program,
    base: set[Fact],
    *,
    variant: str = "restricted",
    max_rounds: int = 200,
) -> ChaseResult:
    """Breadth-first chase: each round executes every rule over the current
    instance (the paper's round semantics, with SNE-free trigger counting).
    Raises if ``max_rounds`` is hit (non-terminating / non-FES input)."""
    facts: set[Fact] = set(base)
    edges: list[ChaseEdge] = []
    triggers = 0
    for rnd in range(1, max_rounds + 1):
        new: set[Fact] = set()
        for rule in program:
            for h in homomorphisms(rule.body, facts):
                triggers += 1
                if variant == "restricted" and _head_satisfied(rule, h, facts):
                    continue
                derived = _instantiate_head(rule, h, variant)
                if derived in facts or derived in new:
                    continue
                src = tuple(
                    (a.pred, tuple(h.get(t, t) for t in a.args)) for a in rule.body
                )
                edges.append(ChaseEdge(src, rule, derived, rnd))
                new.add(derived)
        if not new:
            return ChaseResult(facts, rnd - 1, edges, triggers)
        facts |= new
    raise RuntimeError(f"chase did not terminate within {max_rounds} rounds")
