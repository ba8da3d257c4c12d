"""Table 6 benchmarks: ρDF scenarios — WebPIE/Inferray-like vs GLog."""
import pytest

from repro.harness.runners import run_engine
from repro.harness.tables import rdfs_scenarios

SCENARIOS = {s.name: s for s in rdfs_scenarios("bench")}


@pytest.mark.parametrize("name", sorted(SCENARIOS))
@pytest.mark.parametrize("engine", ["webpie", "inferray", "glog-mr"])
def test_rdfs_engines(once, spark, name, engine):
    r = once(run_engine, spark, engine, SCENARIOS[name])
    assert r.derived > 0
