"""Reproduce paper Table 5 (see EXPERIMENTS.md for paper-vs-measured)."""
from _common import get_spark, scale_arg
from repro.harness.tables import table5

if __name__ == "__main__":
    table5(get_spark(), scale_arg())
