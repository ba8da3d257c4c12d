"""Reproduce paper Table 6 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table6

if __name__ == "__main__":
    table6(get_spark(), scale_arg())
