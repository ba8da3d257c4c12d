"""Table 4 benchmarks: ChaseBench scenarios (existential, non-linear)."""
import pytest

from repro.harness.runners import run_engine
from repro.harness.tables import chasebench_scenarios

SCENARIOS = {s.name: s for s in chasebench_scenarios("bench")}


@pytest.mark.parametrize("name", sorted(SCENARIOS))
@pytest.mark.parametrize("engine", ["vlog", "glog-noopt"])
def test_chasebench_engines(once, spark, name, engine):
    r = once(run_engine, spark, engine, SCENARIOS[name])
    assert r.derived > 0
