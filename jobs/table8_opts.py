"""Reproduce paper Table 8 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table8

if __name__ == "__main__":
    table8(get_spark(), scale_arg())
