"""LUBM-lite: a scaled-down Lehigh University Benchmark.

The paper's LUBM generator emits ~132k facts per university; this
generator emits ~1.1k per university with the same entity mix
(universities → departments → research groups, professors, under/graduate
students, courses, and the takes/teaches/advisor/worksFor/headOf/
subOrganizationOf relationships), deterministically in ``seed``.

Three programs mirror the paper's rulesets with ``LI ⊂ L ⊂ LE``:

- ``LUBM-LI`` — linear only: class/property hierarchies, inverses,
  domain/range rules, including a few *redundant shortcut* rules (as real
  OWL→Datalog translations contain) that give minLinear/minDatalog
  something to eliminate;
- ``LUBM-L``  — adds joins and recursion (suborganization transitivity,
  membership propagation, taught-by);
- ``LUBM-LE`` — adds symmetric+transitive closures (coworker/classmate
  cliques), the owl:sameAs-style blowup that makes the paper's LE runs an
  order of magnitude heavier.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.rules import parse_program
from . import Scenario

LUBM_LI_RULES = """
# class hierarchy (with redundant shortcuts, as OWL translations have)
undergrad(X) -> Student(X)
grad(X) -> Student(X)
grad(X) -> Person(X)
Student(X) -> Person(X)
professor(X) -> Professor(X)
Professor(X) -> Faculty(X)
Faculty(X) -> Employee(X)
Employee(X) -> Person(X)
professor(X) -> Employee(X)
course(X) -> Course(X)
dept(X) -> Organization(X)
university(X) -> Organization(X)
group(X) -> Organization(X)
publication(X,Y) -> Publication(X)
# property hierarchy + inverses
headOf(X,Y) -> WorksFor(X,Y)
worksFor(X,Y) -> WorksFor(X,Y)
WorksFor(X,Y) -> MemberOf(X,Y)
memberOf(X,Y) -> MemberOf(X,Y)
MemberOf(X,Y) -> Member(Y,X)
subOrgOf(X,Y) -> SubOrg(X,Y)
# domain / range rules (linear)
takesCourse(X,Y) -> Student(X)
takesCourse(X,Y) -> Course(Y)
teacherOf(X,Y) -> Faculty(X)
teacherOf(X,Y) -> Course(Y)
advisor(X,Y) -> Person(X)
advisor(X,Y) -> Professor(Y)
publication(X,Y) -> Faculty(Y)
memberOf(X,Y) -> Organization(Y)
subOrgOf(X,Y) -> Organization(X)
subOrgOf(X,Y) -> Organization(Y)
headOf(X,Y) -> Chair(X)
Chair(X) -> Professor(X)
"""

LUBM_L_EXTRA = """
# joins + recursion
SubOrg(X,Y), SubOrg(Y,Z) -> SubOrg(X,Z)
MemberOf(X,Y), SubOrg(Y,Z) -> MemberOf(X,Z)
teacherOf(X,C), takesCourse(Y,C) -> TaughtBy(Y,X)
headOf(X,D), SubOrg(D,U) -> HeadInOrg(X,U)
advisor(X,Y), WorksFor(Y,D) -> HasAdvisorIn(X,D)
"""

LUBM_LE_EXTRA = """
# symmetric + transitive closures (owl:sameAs-style cliques)
worksFor(X,D), worksFor(Y,D) -> Coworker(X,Y)
Coworker(X,Y) -> Coworker(Y,X)
Coworker(X,Y), Coworker(Y,Z) -> Coworker(X,Z)
takesCourse(X,C), takesCourse(Y,C) -> Classmate(X,Y)
Classmate(X,Y) -> Classmate(Y,X)
Classmate(X,Y), Classmate(Y,Z) -> Classmate(X,Z)
"""

PROGRAMS = {
    "LI": LUBM_LI_RULES,
    "L": LUBM_LI_RULES + LUBM_L_EXTRA,
    "LE": LUBM_LI_RULES + LUBM_L_EXTRA + LUBM_LE_EXTRA,
}

N_DEPT, N_GROUP, N_PROF, N_UG, N_GRAD, N_COURSE = 4, 3, 6, 20, 8, 8


def lubm_tables(universities: int, *, seed: int = 0) -> dict[str, pd.DataFrame]:
    """~1.1k facts per university; all ids are globally unique strings."""
    g = np.random.default_rng(seed)
    rows: dict[str, list] = {
        k: []
        for k in (
            "university dept group subOrgOf professor worksFor headOf "
            "undergrad grad memberOf course teacherOf takesCourse advisor "
            "publication"
        ).split()
    }
    for u in range(universities):
        un = f"u{u}"
        rows["university"].append((un,))
        for di in range(N_DEPT):
            d = f"{un}d{di}"
            rows["dept"].append((d,))
            rows["subOrgOf"].append((d, un))
            for gi in range(N_GROUP):
                gr = f"{d}g{gi}"
                rows["group"].append((gr,))
                rows["subOrgOf"].append((gr, d))
            profs = [f"{d}p{i}" for i in range(N_PROF)]
            for i, p in enumerate(profs):
                rows["professor"].append((p,))
                rows["worksFor"].append((p, d))
                rows["publication"].append((f"{p}pub0", p))
                if i == 0:
                    rows["headOf"].append((p, d))
            courses = [f"{d}c{i}" for i in range(N_COURSE)]
            for i, c in enumerate(courses):
                rows["course"].append((c,))
                rows["teacherOf"].append((profs[i % N_PROF], c))
            students = [f"{d}s{i}" for i in range(N_UG + N_GRAD)]
            for i, s in enumerate(students):
                rows["undergrad" if i < N_UG else "grad"].append((s,))
                rows["memberOf"].append((s, d))
                for c in g.choice(N_COURSE, size=3, replace=False):
                    rows["takesCourse"].append((s, courses[c]))
                if i >= N_UG:
                    rows["advisor"].append((s, profs[g.integers(N_PROF)]))
    return {
        pred: pd.DataFrame(data, columns=[f"a{i}" for i in range(len(data[0]))])
        for pred, data in rows.items()
    }


def lubm(variant: str, universities: int, *, seed: int = 0) -> Scenario:
    """variant in {'LI', 'L', 'LE'}."""
    return Scenario(
        name=f"LUBM-{variant}",
        program=parse_program(PROGRAMS[variant]),
        tables=lubm_tables(universities, seed=seed),
    )
