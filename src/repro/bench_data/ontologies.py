"""Scaled-down analogues of UOBM, DBpedia, Claros and Reactome.

Each keeps the structural property the paper uses the scenario for
(DESIGN.md §4): UOBM adds cross-university links and more recursion than
LUBM; DBpedia is *wide* (many predicates, a large shallow linear
program); Claros is *deep* (long subclass chains → TG depth ≳20) with an
expensive transitive closure in its Datalog variant and a symmetric
closure in LE; Reactome's program is linear with **existential** rules,
whose redundant nulls exercise the collective cleaning step.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.rules import parse_program
from . import Scenario


def _df(rows: list[tuple]) -> pd.DataFrame:
    return pd.DataFrame(rows, columns=[f"a{i}" for i in range(len(rows[0]))])


# ------------------------------------------------------------------ UOBM

UOBM_LI_RULES = """
student(X) -> Student(X)
Student(X) -> Person(X)
employee(X) -> Employee(X)
Employee(X) -> Person(X)
college(X) -> Organization(X)
enrolledIn(X,Y) -> Student(X)
enrolledIn(X,Y) -> Organization(Y)
friendOf(X,Y) -> Person(X)
friendOf(X,Y) -> Person(Y)
hasDegreeFrom(X,Y) -> Person(X)
hasDegreeFrom(X,Y) -> Organization(Y)
worksAt(X,Y) -> Employee(X)
worksAt(X,Y) -> WorksAt(X,Y)
partOfOrg(X,Y) -> PartOfOrg(X,Y)
"""

UOBM_L_EXTRA = """
friendOf(X,Y) -> Knows(X,Y)
Knows(X,Y) -> Knows(Y,X)
Knows(X,Y), Knows(Y,Z) -> Knows(X,Z)
PartOfOrg(X,Y), PartOfOrg(Y,Z) -> PartOfOrg(X,Z)
enrolledIn(X,C), PartOfOrg(C,U) -> EnrolledInOrg(X,U)
WorksAt(X,C), PartOfOrg(C,U) -> WorksAtOrg(X,U)
hasDegreeFrom(X,U), WorksAt(Y,U) -> SameOrgLink(X,Y)
"""


def uobm_tables(scale: int, *, seed: int = 1) -> dict[str, pd.DataFrame]:
    """``scale`` ~ number of colleges; friend graph is clustered so the
    Knows closure stays polynomially bounded."""
    g = np.random.default_rng(seed)
    rows: dict[str, list] = {
        k: []
        for k in "student employee college enrolledIn friendOf hasDegreeFrom worksAt partOfOrg".split()
    }
    for c in range(scale):
        col = f"col{c}"
        rows["college"].append((col,))
        if c:
            rows["partOfOrg"].append((col, f"col{g.integers(c)}"))
        people = [f"c{c}p{i}" for i in range(30)]
        for i, p in enumerate(people):
            if i < 22:
                rows["student"].append((p,))
                rows["enrolledIn"].append((p, col))
            else:
                rows["employee"].append((p,))
                rows["worksAt"].append((p, col))
            rows["hasDegreeFrom"].append((p, f"col{g.integers(scale)}"))
        # friend edges inside small cliques of 5
        for start in range(0, 30, 5):
            grp = people[start : start + 5]
            for i in range(len(grp) - 1):
                rows["friendOf"].append((grp[i], grp[i + 1]))
    return {p: _df(r) for p, r in rows.items() if r}


def uobm(variant: str, scale: int, *, seed: int = 1) -> Scenario:
    rules = UOBM_LI_RULES + (UOBM_L_EXTRA if variant == "L" else "")
    return Scenario(f"UOBM-{variant}", parse_program(rules), uobm_tables(scale, seed=seed))


# --------------------------------------------------------------- DBpedia

def dbpedia_rules(variant: str, *, n_props: int = 40, n_classes: int = 30) -> str:
    """A wide, shallow program: every infobox property maps to a class via
    domain/range rules, classes form a branching hierarchy, and many
    property-renaming rules — mimicking the breadth of the paper's
    4k–9k-rule DBpedia programs (TG: many nodes, modest depth)."""
    lines = []
    for i in range(n_props):
        c = i % n_classes
        lines.append(f"p{i}(X,Y) -> C{c}(X)")
        lines.append(f"p{i}(X,Y) -> C{(c + 7) % n_classes}(Y)")
        lines.append(f"p{i}(X,Y) -> P{i}(X,Y)")
        if i % 3 == 0:
            lines.append(f"P{i}(X,Y) -> P{(i + 1) % n_props}(X,Y)")
    for c in range(n_classes):
        if c:
            lines.append(f"C{c}(X) -> C{c // 2}(X)")
        lines.append(f"C{c}(X) -> Thing(X)")
    if variant == "L":
        lines += [
            "P0(X,Y), P1(Y,Z) -> Linked(X,Z)",
            "Linked(X,Y), P2(Y,Z) -> Linked(X,Z)",
            "P3(X,Y), P3(Z,Y) -> SharedTarget(X,Z)",
        ]
    return "\n".join(lines)


def dbpedia_tables(n_facts: int, *, n_props: int = 40, seed: int = 2) -> dict[str, pd.DataFrame]:
    g = np.random.default_rng(seed)
    n_ent = max(10, n_facts // 8)
    rows: dict[str, list] = {}
    preds = g.integers(0, n_props, n_facts)
    subs = g.integers(0, n_ent, n_facts)
    objs = g.integers(0, n_ent, n_facts)
    for p, s, o in zip(preds, subs, objs):
        rows.setdefault(f"p{p}", []).append((f"e{s}", f"e{o}"))
    return {p: _df(r) for p, r in rows.items()}


def dbpedia(variant: str, n_facts: int, *, seed: int = 2) -> Scenario:
    return Scenario(
        f"DBpedia-{variant}",
        parse_program(dbpedia_rules(variant)),
        dbpedia_tables(n_facts, seed=seed),
    )


# ---------------------------------------------------------------- Claros

def claros_rules(variant: str, *, depth: int = 20) -> str:
    """Deep subclass chain (TG depth ≈ paper's 23) + property chain; the
    'L' variant adds the expensive relatedPlaces-style transitive closure,
    'LE' additionally makes it symmetric (the paper's hardest scenario)."""
    lines = ["obj(X) -> K0(X)", "relatedTo(X,Y) -> Rel(X,Y)"]
    for i in range(1, depth):
        lines.append(f"K{i - 1}(X) -> K{i}(X)")
    lines += ["link(X,Y) -> Rel(X,Y)", "Rel(X,Y) -> K0(X)", "Rel(X,Y) -> K0(Y)"]
    if variant in ("L", "LE"):
        lines += ["Rel(X,Y), Rel(Y,Z) -> Conn(X,Z)", "Rel(X,Y) -> Conn(X,Y)",
                  "Conn(X,Y), Rel(Y,Z) -> Conn(X,Z)"]
    if variant == "LE":
        lines += ["Conn(X,Y) -> Conn(Y,X)"]
    return "\n".join(lines)


def claros_tables(n_objs: int, *, cluster: int = 10, seed: int = 3) -> dict[str, pd.DataFrame]:
    """Objects in chains of length ``cluster`` with a few extra in-cluster
    links: the Conn closure is quadratic per cluster, linear overall."""
    g = np.random.default_rng(seed)
    obj_rows, rel_rows, link_rows = [], [], []
    for o in range(n_objs):
        obj_rows.append((f"o{o}",))
        nxt = o + 1
        if nxt % cluster and nxt < n_objs:
            rel_rows.append((f"o{o}", f"o{nxt}"))
    for _ in range(n_objs // 6):
        c = g.integers(max(1, n_objs // cluster))
        a, b = g.integers(cluster, size=2)
        x, y = c * cluster + a, c * cluster + b
        if x < n_objs and y < n_objs and x != y:
            link_rows.append((f"o{x}", f"o{y}"))
    out = {"obj": _df(obj_rows), "relatedTo": _df(rel_rows)}
    if link_rows:
        out["link"] = _df(link_rows)
    return out


def claros(variant: str, n_objs: int, *, cluster: int = 10, seed: int = 3) -> Scenario:
    return Scenario(
        f"Claros-{variant}",
        parse_program(claros_rules(variant)),
        claros_tables(n_objs, cluster=cluster, seed=seed),
    )


# -------------------------------------------------------------- Reactome

REACTOME_LI_RULES = """
pathway(X) -> Pathway(X)
reaction(X) -> Reaction(X)
Reaction(X) -> Event(X)
Pathway(X) -> Event(X)
partOf(X,Y) -> PartOf(X,Y)
PartOf(X,Y) -> Includes(Y,X)
PartOf(X,Y) -> HasEvent(Y,X)
pathway(X) -> HasEvent(X,Z)
reaction(X) -> ControlledBy(X,Z)
input(X,Y) -> Consumes(X,Y)
Consumes(X,Y) -> Protein(Y)
partOf(X,Y) -> Reaction(X)
partOf(X,Y) -> Pathway(Y)
Protein(X) -> Entity(X)
Event(X) -> Entity(X)
"""


def reactome_tables(n_pathways: int, *, seed: int = 4) -> dict[str, pd.DataFrame]:
    g = np.random.default_rng(seed)
    rows: dict[str, list] = {k: [] for k in "pathway reaction partOf input".split()}
    for p in range(n_pathways):
        pw = f"pw{p}"
        rows["pathway"].append((pw,))
        for r in range(4):
            rx = f"{pw}r{r}"
            rows["reaction"].append((rx,))
            rows["partOf"].append((rx, pw))
            for q in g.integers(0, n_pathways * 2, size=2):
                rows["input"].append((rx, f"prot{q}"))
    return {p: _df(r) for p, r in rows.items()}


def reactome(n_pathways: int, *, seed: int = 4) -> Scenario:
    """Linear with existentials: every pathway's HasEvent null is made
    redundant by a PartOf-derived event, so collective cleaning removes it
    (the Example 1 / Reactome-LI mechanism)."""
    return Scenario(
        "Reactome-LI", parse_program(REACTOME_LI_RULES), reactome_tables(n_pathways, seed=seed)
    )
