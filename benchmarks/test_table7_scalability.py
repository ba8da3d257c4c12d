"""Table 7 benchmarks: LUBM-L scalability sweep (GLog m+r)."""
import pytest

from repro.bench_data.lubm import lubm
from repro.harness.runners import run_engine


@pytest.mark.parametrize("universities", [2, 4, 8])
def test_scalability(once, spark, universities):
    sc = lubm("L", universities)
    r = once(run_engine, spark, "glog-mr", sc)
    assert r.derived > 0
