"""Table 3 benchmarks: Datalog scenarios — chase engines vs TGmat with
optimization variants (No opt / m / m+r)."""
import pytest

from repro.harness.runners import run_engine
from repro.harness.tables import datalog_scenarios

SCENARIOS = {
    s.name: s
    for s in datalog_scenarios("bench")
    if s.name in ("LUBM-L", "LUBM-LE", "Claros-L")
}
ENGINES = ["vlog", "rdfox", "glog-noopt", "glog-mr"]


@pytest.mark.parametrize("name", sorted(SCENARIOS))
@pytest.mark.parametrize("engine", ENGINES)
def test_datalog_engines(once, spark, name, engine):
    r = once(run_engine, spark, engine, SCENARIOS[name])
    assert r.derived > 0
