"""ChaseBench-lite: iBench-style schema-mapping scenarios (STB-128 /
ONT-256 analogues).

Source relations map into a target schema through **existential** TGDs
(every target entity gets invented identifiers), target-to-target rules
join and recurse over the invented values — the paper's reason for
picking these scenarios ("non-linear rules with existentials that involve
many joins and that are highly recursive").  The ruleset is weakly
acyclic, so the restricted and skolem chases terminate.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.rules import parse_program
from . import Scenario

STB_RULES = """
# source -> target with invented values
s_person(N,A) -> t_person(N,Z)
s_person(N,A) -> t_addr(N,A)
s_company(C,N) -> t_org(C,Z)
s_emp(P,C) -> t_job(P,C,Z)
# target joins (use invented ids)
t_person(N,I), t_job(N,C,J) -> t_worksAt(I,C)
t_org(C,I), t_worksAt(P,C) -> t_member(P,I)
t_member(P,O), t_member(Q,O) -> t_colleague(P,Q)
# recursion over target
s_mgr(X,Y) -> t_reports(X,Y)
t_reports(X,Y), t_reports(Y,Z) -> t_reports(X,Z)
t_reports(X,Y), t_person(X,I) -> t_managed(I,Y)
"""

ONT_EXTRA = """
s_proj(P,C) -> t_proj(P,C,Z)
t_proj(P,C,I), t_org(C,J) -> t_funds(J,I)
t_job(P,C,J), t_proj(X,C,I) -> t_assigned(P,I)
t_assigned(P,I), t_assigned(Q,I) -> t_collab(P,Q)
t_collab(P,Q) -> t_collab(Q,P)
s_area(P,A) -> t_area(P,A)
t_assigned(P,I), t_area(P,A) -> t_projArea(I,A)
"""


def _tables(n_people: int, *, with_proj: bool, seed: int) -> dict[str, pd.DataFrame]:
    g = np.random.default_rng(seed)
    n_comp = max(2, n_people // 20)
    rows = {
        "s_person": [(f"n{i}", f"addr{i % (n_people // 4 + 1)}") for i in range(n_people)],
        "s_company": [(f"c{i}", f"cn{i}") for i in range(n_comp)],
        "s_emp": [(f"n{i}", f"c{g.integers(n_comp)}") for i in range(n_people)],
        "s_mgr": [
            (f"n{i}", f"n{g.integers(i)}") for i in range(1, n_people, 3)
        ],
    }
    if with_proj:
        rows["s_proj"] = [
            (f"pr{i}", f"c{g.integers(n_comp)}") for i in range(n_comp * 3)
        ]
        rows["s_area"] = [
            (f"n{i}", f"ar{g.integers(8)}") for i in range(0, n_people, 2)
        ]
    return {
        p: pd.DataFrame(r, columns=[f"a{i}" for i in range(len(r[0]))])
        for p, r in rows.items()
    }


def stb128(n_people: int = 400, *, seed: int = 7) -> Scenario:
    return Scenario(
        "STB-128", parse_program(STB_RULES), _tables(n_people, with_proj=False, seed=seed)
    )


def ont256(n_people: int = 800, *, seed: int = 8) -> Scenario:
    return Scenario(
        "ONT-256",
        parse_program(STB_RULES + ONT_EXTRA),
        _tables(n_people, with_proj=True, seed=seed),
    )
