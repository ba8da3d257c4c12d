"""Triple-encoded datasets for the ρDF (RDFS) scenarios.

ρDF captures the essential RDFS semantics with a handful of rules over a
single triple relation; both datasets are deterministic synthetics:

- ``lubm_triples``: the LUBM-lite world flattened into triples with its
  class/property hierarchy asserted as ``sc``/``sp``/``dom``/``rng``
  schema triples (the paper's 16.7M-triple LUBM KB, scaled down);
- ``yago_lite``: a deep, branching taxonomy with instances typed at the
  leaves plus subPropertyOf chains (the paper's YAGO KB, scaled down).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ..core.rules import parse_program
from . import Scenario
from .lubm import lubm_tables

RHO_DF_RULES = """
t(S,P,O) -> T(S,P,O)
T(A,sp,B), T(B,sp,C) -> T(A,sp,C)
T(S,P,O), T(P,sp,Q) -> T(S,Q,O)
T(A,sc,B), T(B,sc,C) -> T(A,sc,C)
T(S,type,A), T(A,sc,B) -> T(S,type,B)
T(P,dom,A), T(S,P,O) -> T(S,type,A)
T(P,rng,A), T(S,P,O) -> T(O,type,A)
"""


def rho_df_program():
    return parse_program(RHO_DF_RULES)


_LUBM_SCHEMA = [
    # class hierarchy (sc) over the LUBM-lite classes
    ("Undergrad", "sc", "Student"), ("Grad", "sc", "Student"),
    ("Student", "sc", "Person"), ("Prof", "sc", "Faculty"),
    ("Faculty", "sc", "Employee"), ("Employee", "sc", "Person"),
    ("Dept", "sc", "Org"), ("University", "sc", "Org"), ("Group", "sc", "Org"),
    # property hierarchy (sp) + domains/ranges
    ("headOf", "sp", "worksFor"), ("worksFor", "sp", "memberOf"),
    ("memberOf", "dom", "Person"), ("memberOf", "rng", "Org"),
    ("takesCourse", "dom", "Student"), ("takesCourse", "rng", "Course"),
    ("teacherOf", "dom", "Faculty"), ("teacherOf", "rng", "Course"),
    ("advisor", "dom", "Person"), ("advisor", "rng", "Prof"),
    ("subOrgOf", "dom", "Org"), ("subOrgOf", "rng", "Org"),
]

_TYPE_OF_UNARY = {
    "university": "University", "dept": "Dept", "group": "Group",
    "professor": "Prof", "undergrad": "Undergrad", "grad": "Grad",
    "course": "Course",
}


def lubm_triples(universities: int, *, seed: int = 0) -> Scenario:
    tables = lubm_tables(universities, seed=seed)
    triples: list[tuple[str, str, str]] = list(_LUBM_SCHEMA)
    for pred, df in tables.items():
        if pred in _TYPE_OF_UNARY:
            triples += [(s, "type", _TYPE_OF_UNARY[pred]) for s in df["a0"]]
        elif len(df.columns) == 2:
            triples += [(s, pred, o) for s, o in zip(df["a0"], df["a1"])]
    return Scenario(
        "LUBM-rdfs",
        rho_df_program(),
        {"t": pd.DataFrame(triples, columns=["a0", "a1", "a2"])},
    )


def yago_lite(n_instances: int, *, depth: int = 8, branch: int = 3, seed: int = 9) -> Scenario:
    """Taxonomy tree of the given depth/branching; instances typed at
    random leaves; a subPropertyOf chain over 12 relations."""
    g = np.random.default_rng(seed)
    triples: list[tuple[str, str, str]] = []
    # class tree: level l has branch**l classes
    leaves: list[str] = []
    prev = ["root"]
    for level in range(1, depth + 1):
        cur = []
        for i, parent in enumerate(prev):
            for b in range(branch):
                c = f"c{level}_{i}_{b}"
                triples.append((c, "sc", parent))
                cur.append(c)
        prev = cur
    leaves = prev
    for p in range(1, 12):
        triples.append((f"r{p}", "sp", f"r{p - 1}"))
    triples += [("r0", "dom", "root"), ("r6", "rng", leaves[0])]
    for i in range(n_instances):
        triples.append((f"i{i}", "type", leaves[g.integers(len(leaves))]))
        if i:
            triples.append((f"i{i}", f"r{g.integers(1, 12)}", f"i{g.integers(i)}"))
    return Scenario(
        "YAGO",
        rho_df_program(),
        {"t": pd.DataFrame(triples, columns=["a0", "a1", "a2"])},
    )
