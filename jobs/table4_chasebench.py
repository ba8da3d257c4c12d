"""Reproduce paper Table 4 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table4

if __name__ == "__main__":
    table4(get_spark(), scale_arg())
