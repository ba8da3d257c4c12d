"""Reproduce paper Table 2 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table2

if __name__ == "__main__":
    table2(get_spark(), scale_arg())
