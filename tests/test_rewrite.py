"""EG-rewritings and minDatalog (paper Section 6, Definitions 17 & 19),
including the paper's Example 43."""
import pytest

from repro.core.eg import EG
from repro.core.rewrite import eg_rewriting, find_dominating
from repro.core.rules import parse_program
from repro.core.unify import CQ, cq_contained, ucq_contained

from tests.helpers import prog


def _cq_norm(q: CQ) -> CQ:
    """Rename variables canonically for structural comparison."""
    ren = {}
    for a in q.body:
        for v in a.vars:
            ren.setdefault(v, f"V{len(ren)}")
    from repro.core.rules import Atom
    return CQ(
        tuple(ren.get(t, t) for t in q.head),
        tuple(Atom(a.pred, tuple(ren.get(t, t) for t in a.args)) for a in q.body),
    )


class TestExample43:
    """rew(u2) for r10: r(X,Y,Z) -> T(X,X,Y); r11: T(X,Y,Z) -> R(Y,Z)."""

    def setup_method(self):
        p = parse_program("r(X1,Y1,Z1) -> T(X1,X1,Y1)\nT(X2,Y2,Z2) -> R(Y2,Z2)")
        self.g = EG()
        u1 = self.g.add(p.rules[0], {})
        self.u2 = self.g.add(p.rules[1], {0: [u1]})

    def test_rewriting_is_single_cq(self):
        rw = eg_rewriting(self.u2)
        assert rw is not None and len(rw) == 1

    def test_rewriting_matches_paper(self):
        # paper result: Q(Y2, Z2) <- r(Y2, Z2, Z1)
        got = _cq_norm(eg_rewriting(self.u2)[0])
        want = _cq_norm(
            CQ(("Y2", "Z2"), (parse_program("r(Y2,Z2,W) -> X(Y2)").rules[0].body[0],))
        )
        assert got.body[0].pred == "r"
        # head vars are positions 0 and 1 of the r-atom; third is free
        assert got.head == got.body[0].args[:2]
        assert got.body[0].args[2] not in got.head


def test_root_node_rewriting_is_own_body():
    p = prog("a(X,Y) -> B(Y,X)")
    g = EG()
    n = g.add(p.rules[0], {})
    rw = eg_rewriting(n)
    assert len(rw) == 1 and rw[0].body[0].pred == "a"
    assert rw[0].head == (rw[0].body[0].args[1], rw[0].body[0].args[0])


def test_group_rewriting_is_ucq():
    p = prog("a(X) -> B(X)\nc(X) -> B(X)\nB(X) -> D(X)")
    g = EG()
    n1 = g.add(p.rules[0], {})
    n2 = g.add(p.rules[1], {})
    nd = g.add(p.rules[2], {0: [n1, n2]})
    rw = eg_rewriting(nd)
    assert {q.body[0].pred for q in rw} == {"a", "c"}


def test_empty_group_drops_disjunct():
    p = prog("a(X) -> B(X)\nB(X) -> D(X)")
    g = EG()
    nd = g.add(p.rules[1], {0: []})
    assert eg_rewriting(nd) == []


def test_caps_return_none():
    rules = "\n".join([f"a{i}(X) -> B(X)" for i in range(8)]) + "\nB(X) -> D(X)"
    p = prog(rules)
    g = EG()
    roots = [g.add(r, {}) for r in p.rules[:-1]]
    nd = g.add(p.rules[-1], {0: roots})
    assert eg_rewriting(nd, max_disjuncts=3) is None
    assert eg_rewriting(nd, max_disjuncts=48) is not None


def test_join_rule_rewriting():
    p = prog("e(X,Y) -> R(X,Y)\nR(X,Y), R(Y,Z) -> R(X,Z)")
    g = EG()
    n0 = g.add(p.rules[0], {})
    n1 = g.add(p.rules[1], {0: [n0], 1: [n0]})
    rw = eg_rewriting(n1)
    assert len(rw) == 1 and [a.pred for a in rw[0].body] == ["e", "e"]
    # the join variable is shared between the two atoms
    a, b = rw[0].body
    assert a.args[1] == b.args[0]


def test_lemma18_rewriting_answers_equal_node_facts():
    """Lemma 18 on a driver-side instance: answers to rew(v) == v(B)."""
    from repro.core.unify import homomorphisms

    p = prog("e(X,Y) -> R(X,Y)\nR(X,Y), R(Y,Z) -> R(X,Z)")
    g = EG()
    n0 = g.add(p.rules[0], {})
    n1 = g.add(p.rules[1], {0: [n0], 1: [n0]})
    base = [("e", ("a", "b")), ("e", ("b", "c")), ("e", ("c", "d"))]
    rw = eg_rewriting(n1)[0]
    answers = {
        tuple(h.get(t, t) for t in rw.head) for h in homomorphisms(rw.body, base)
    }
    assert answers == {("a", "c"), ("b", "d")}  # 2-step paths


# ----------------------------------------------------- find_dominating

def test_dominating_same_pred_and_depth_rule():
    p = prog("a(X) -> B(X)\nB(X) -> C(X)\nB(X) -> B(X)")
    g = EG()
    n0 = g.add(p.rules[0], {})
    nc = g.add(p.rules[2], {0: [n0]})  # B->B copy node: rew == rew(n0)
    rw = {n.nid: eg_rewriting(n) for n in (n0, nc)}
    assert find_dominating(nc, [n0], rw) is n0
    assert find_dominating(n0, [n0], rw) is None  # never self


def test_dominating_respects_depth():
    p = prog("a(X) -> B(X)\nB(X) -> B(X)")
    g = EG()
    n0 = g.add(p.rules[0], {})
    nc = g.add(p.rules[1], {0: [n0]})
    rw = {n.nid: eg_rewriting(n) for n in (n0, nc)}
    # deeper node cannot dominate a shallower one per Def. 19
    assert find_dominating(n0, [nc], rw) is None


def test_dominating_skips_capped():
    p = prog("a(X) -> B(X)\nB(X) -> B(X)")
    g = EG()
    n0 = g.add(p.rules[0], {})
    nc = g.add(p.rules[1], {0: [n0]})
    rw = {n0.nid: eg_rewriting(n0), nc.nid: None}
    assert find_dominating(nc, [n0], rw) is None


def test_dominating_different_pred_never():
    p = prog("a(X) -> B(X)\na(X) -> C(X)")
    g = EG()
    nb = g.add(p.rules[0], {})
    nc = g.add(p.rules[1], {})
    rw = {n.nid: eg_rewriting(n) for n in (nb, nc)}
    assert find_dominating(nc, [nb], rw) is None


def test_containment_of_specialized_disjuncts():
    # rewriting with a constant is contained in the generic one
    q1 = [CQ(("X",), (parse_program("p(X,red) -> Q(X)").rules[0].body[0],))]
    q2 = [CQ(("X",), (parse_program("p(X,Y) -> Q(X)").rules[0].body[0],))]
    assert ucq_contained(q1, q2) and not ucq_contained(q2, q1)
    assert cq_contained(q1[0], q2[0])
