"""Unification, homomorphism and containment unit tests (Section 3)."""
import pytest

from repro.core.rules import Atom, parse_atom
from repro.core.unify import (
    CQ,
    apply_sub,
    cq_contained,
    entails,
    fact_homomorphism,
    homomorphisms,
    instances_equivalent,
    mgu,
    ucq_contained,
)


# ------------------------------------------------------------------ MGU

def test_mgu_identical():
    a = parse_atom("p(X,Y)")
    assert mgu(a, a) == {}


def test_mgu_var_to_var():
    s = mgu(parse_atom("p(X,Y)"), parse_atom("p(A,B)"))
    assert apply_sub(parse_atom("p(X,Y)"), s) == apply_sub(parse_atom("p(A,B)"), s)


def test_mgu_var_to_const():
    s = mgu(parse_atom("p(X,c)"), parse_atom("p(a,Y)"))
    assert s["X"] == "a" and s["Y"] == "c"


def test_mgu_const_clash():
    assert mgu(parse_atom("p(a)"), parse_atom("p(b)")) is None


def test_mgu_pred_mismatch():
    assert mgu(parse_atom("p(X)"), parse_atom("q(X)")) is None


def test_mgu_repeated_vars():
    s = mgu(parse_atom("p(X,X)"), parse_atom("p(a,Y)"))
    assert apply_sub(parse_atom("p(X,X)"), s) == Atom("p", ("a", "a"))


def test_mgu_occurs_chain():
    s = mgu(parse_atom("p(X,Y,X)"), parse_atom("p(Y,Z,a)"))
    a = apply_sub(parse_atom("p(X,Y,X)"), s)
    b = apply_sub(parse_atom("p(Y,Z,a)"), s)
    assert a == b == Atom("p", ("a", "a", "a"))


# ------------------------------------------------- trigger enumeration

FACTS = [("e", ("a", "b")), ("e", ("b", "c")), ("e", ("a", "a"))]


def test_homomorphisms_single_atom():
    hs = homomorphisms((parse_atom("e(X,Y)"),), FACTS)
    assert len(hs) == 3


def test_homomorphisms_join():
    hs = homomorphisms((parse_atom("e(X,Y)"), parse_atom("e(Y,Z)")), FACTS)
    got = {(h["X"], h["Y"], h["Z"]) for h in hs}
    assert got == {("a", "b", "c"), ("a", "a", "b"), ("a", "a", "a")}


def test_homomorphisms_diagonal():
    hs = homomorphisms((parse_atom("e(X,X)"),), FACTS)
    assert [h["X"] for h in hs] == ["a"]


def test_homomorphisms_constant():
    hs = homomorphisms((parse_atom("e(a,Y)"),), FACTS)
    assert {h["Y"] for h in hs} == {"b", "a"}


def test_homomorphisms_seed():
    hs = homomorphisms((parse_atom("e(X,Y)"),), FACTS, seed={"X": "b"})
    assert [h["Y"] for h in hs] == ["c"]


def test_homomorphisms_empty_when_no_match():
    assert homomorphisms((parse_atom("q(X)"),), FACTS) == []


# ------------------------------------------- fact-set homomorphisms

def test_fact_hom_null_to_const():
    src = {("T", ("c2", "c1", "_:n1"))}
    dst = {("T", ("c2", "c1", "c2"))}
    h = fact_homomorphism(src, dst)
    assert h == {"_:n1": "c2"}


def test_fact_hom_respects_fixed():
    src = {("T", ("c2", "c1", "_:n1"))}
    dst = {("T", ("c2", "c1", "c2"))}
    assert fact_homomorphism(src, dst, fixed=frozenset(["_:n1"])) is None


def test_fact_hom_constants_rigid():
    assert fact_homomorphism({("p", ("a",))}, {("p", ("b",))}) is None


def test_fact_hom_consistent_nulls():
    src = {("p", ("_:n1", "_:n1"))}
    assert fact_homomorphism(src, {("p", ("a", "b"))}) is None
    assert fact_homomorphism(src, {("p", ("a", "a"))}) == {"_:n1": "a"}


def test_fact_hom_multi_fact():
    src = {("p", ("a", "_:n1")), ("q", ("_:n1", "b"))}
    dst = {("p", ("a", "x")), ("q", ("x", "b")), ("q", ("y", "b"))}
    assert fact_homomorphism(src, dst) == {"_:n1": "x"}


def test_entails_and_equivalence():
    ground = {("p", ("a", "b"))}
    nully = {("p", ("a", "_:n9"))}
    assert entails(ground, nully) and not entails(nully, ground)
    assert instances_equivalent(nully, {("p", ("a", "_:n7"))})


# ------------------------------------------------------ containment

def q(head, body_atoms):
    return CQ(tuple(head), tuple(parse_atom(b) for b in body_atoms))


def test_cq_contained_identity():
    q1 = q(["X"], ["e(X,Y)"])
    assert cq_contained(q1, q1)


def test_cq_longer_path_in_shorter():
    two = q(["X"], ["e(X,Y)", "e(Y,Z)"])
    one = q(["X"], ["e(X,Y)"])
    assert cq_contained(two, one)
    assert not cq_contained(one, two)


def test_cq_binary_head_paths_incomparable():
    two = q(["X", "Z"], ["e(X,Y)", "e(Y,Z)"])
    one = q(["X", "Y"], ["e(X,Y)"])
    assert not cq_contained(two, one) and not cq_contained(one, two)


def test_cq_constant_specializes():
    spec = q(["X"], ["p(X,red)"])
    gen = q(["X"], ["p(X,Y)"])
    assert cq_contained(spec, gen) and not cq_contained(gen, spec)


def test_cq_head_arity_mismatch():
    assert not cq_contained(q(["X"], ["e(X,Y)"]), q(["X", "Y"], ["e(X,Y)"]))


def test_ucq_containment():
    u1 = [q(["X"], ["e(X,Y)", "e(Y,Z)"]), q(["X"], ["p(X,red)"])]
    u2 = [q(["X"], ["e(X,Y)"]), q(["X"], ["p(X,Y)"])]
    assert ucq_contained(u1, u2)
    assert not ucq_contained(u2, u1)


def test_ucq_empty_contained_in_all():
    assert ucq_contained([], [q(["X"], ["e(X,Y)"])])
    assert ucq_contained([], [])
    assert not ucq_contained([q(["X"], ["e(X,Y)"])], [])
