"""Inject results/*.csv into EXPERIMENTS.md.

Replaces each ``<!-- TABLEN -->`` placeholder with the corresponding CSV
rendered as a GitHub markdown table.  Idempotent: placeholders are kept as
HTML comments next to the injected tables so reruns refresh in place.
"""
from __future__ import annotations

import os
import re
import sys

import pandas as pd

HERE = os.path.dirname(os.path.abspath(__file__))
ROOT = os.path.dirname(HERE)

FILES = {
    "TABLE1": "table1_stats.csv",
    "TABLE2": "table2_linear.csv",
    "TABLE3": "table3_datalog.csv",
    "TABLE4": "table4_chasebench.csv",
    "TABLE5": "table5_triggers.csv",
    "TABLE6": "table6_rdfs.csv",
    "TABLE7": "table7_scalability.csv",
    "TABLE8": "table8_opts.csv",
}


def to_markdown(df: pd.DataFrame) -> str:
    header = "| " + " | ".join(df.columns) + " |"
    sep = "|" + "---|" * len(df.columns)
    rows = [
        "| " + " | ".join("" if pd.isna(v) else str(v) for v in rec) + " |"
        for rec in df.itertuples(index=False)
    ]
    return "\n".join([header, sep, *rows])


def main() -> int:
    path = os.path.join(ROOT, "EXPERIMENTS.md")
    text = open(path).read()
    for tag, fname in FILES.items():
        csv = os.path.join(ROOT, "results", fname)
        if not os.path.exists(csv):
            print(f"skip {tag}: {fname} missing")
            continue
        table = to_markdown(pd.read_csv(csv))
        block = f"<!-- {tag} -->\n\n{table}\n<!-- /{tag} -->"
        pat = re.compile(
            rf"<!-- {tag} -->(?:.*?<!-- /{tag} -->)?", re.DOTALL
        )
        text, n = pat.subn(block, text, count=1)
        print(f"{'filled' if n else 'no placeholder for'} {tag}")
    open(path, "w").write(text)
    return 0


if __name__ == "__main__":
    sys.exit(main())
