"""Reproduce paper Table 3 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table3

if __name__ == "__main__":
    table3(get_spark(), scale_arg())
