"""Reproduce paper Table 7 (scalability): LUBM-L at growing input sizes.

Pass a comma-separated list of university counts (default 2,4,8,16,32,64).
"""
import sys

from _common import get_spark
from repro.harness.tables import table7

if __name__ == "__main__":
    sizes = (
        [int(x) for x in sys.argv[1].split(",")] if len(sys.argv) > 1 else None
    )
    table7(get_spark(), sizes)
