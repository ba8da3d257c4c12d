"""Benchmark-local fixtures: every benchmark runs one (engine, scenario)
pair exactly once per measurement (Spark runs take seconds; statistical
repetition is wasted wall-clock here)."""
import pytest


@pytest.fixture
def once(benchmark):
    """pedantic single-shot wrapper: bench(fn, *args) -> fn's result."""

    def run(fn, *args, **kwargs):
        return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)

    return run


import os

# benchmarks run at 'bench' scale (~10^4-10^5 rows): small shuffles, many
# rounds — low partition counts keep per-round latency representative
os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
