"""Test-local tuning: the correctness suite runs many iterative engine
loops over tiny instances, where per-round shuffle/checkpoint overhead at
the default 64 partitions dominates wall time.  The session fixture in the
root conftest honours SPARK_SHUFFLE_PARTITIONS, which must be set before
the fixture instantiates — conftest import time is early enough."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "4")
