"""Run measurements.

The paper reports wall time, peak RAM, and #triggers.  Wall time and
triggers transfer directly.  Peak RAM does not transfer from a C++
in-memory engine to a JVM/Spark stack: we report the driver's peak RSS
(``ru_maxrss``; monotone over the process lifetime, so only deltas within
one job run are meaningful) and use the number of *materialized fact
rows* as the cross-engine memory proxy (EXPERIMENTS.md, memory columns).
"""
from __future__ import annotations

import resource
from dataclasses import asdict, dataclass, field


def peak_rss_mb() -> float:
    """Driver peak RSS in MiB (Linux reports ru_maxrss in KiB)."""
    return resource.getrusage(resource.RUSAGE_SELF).ru_maxrss / 1024.0


@dataclass
class RunResult:
    """One (scenario, engine) measurement — a row of a paper table."""

    scenario: str
    engine: str
    wall_s: float
    rounds: int = 0
    triggers: int = -1
    derived: int = 0
    rss_mb: float = 0.0
    tg_nodes: int = 0
    tg_edges: int = 0
    tg_depth: int = 0
    extra: dict = field(default_factory=dict)

    def as_row(self) -> dict:
        d = asdict(self)
        d.update(d.pop("extra"))
        return d
