"""Deterministic synthetic stand-ins for the paper's benchmarks (see
DESIGN.md §4 for each substitution and why it preserves the shape)."""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from ..core.rules import Program


@dataclass
class Scenario:
    """A named (program, data) pair at some scale; ``tables`` maps each
    extensional predicate to a pandas DataFrame of string facts."""

    name: str
    program: Program
    tables: dict[str, pd.DataFrame]

    @property
    def n_edb(self) -> int:
        return sum(len(t) for t in self.tables.values())

    @property
    def n_rules(self) -> int:
        return len(self.program.rules)
