"""Table 2 benchmarks: linear scenarios — chase engines vs TG-guided
reasoning (tglinear + minLinear + Definition 5)."""
import pytest

from repro.harness.runners import run_engine, run_linear_tg
from repro.harness.tables import linear_scenarios

SCENARIOS = {
    s.name: s
    for s in linear_scenarios("bench")
    if s.name in ("LUBM-LI", "Claros-LI", "Reactome-LI")
}


@pytest.mark.parametrize("name", sorted(SCENARIOS))
@pytest.mark.parametrize("engine", ["vlog", "rdfox"])
def test_chase_engines(once, spark, name, engine):
    r = once(run_engine, spark, engine, SCENARIOS[name])
    assert r.derived > 0


@pytest.mark.parametrize("name", sorted(SCENARIOS))
def test_glog_linear(once, spark, name):
    r = once(run_linear_tg, spark, SCENARIOS[name])
    assert r.derived > 0 and r.tg_nodes > 0
