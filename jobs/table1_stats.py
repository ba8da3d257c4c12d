"""Reproduce paper Table 1 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table1

if __name__ == "__main__":
    table1(get_spark(), scale_arg())
