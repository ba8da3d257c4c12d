"""Builders for the paper's evaluation tables (Section 7).

Each ``tableN`` function runs the scenarios/engines of the corresponding
paper table at a configurable scale, prints the rows, writes
``results/tableN*.csv`` and returns the pandas DataFrame.  Paper numbers
live next to these in EXPERIMENTS.md.

Scales: ``test`` (seconds, used by pytest), ``bench`` (tens of seconds,
pytest-benchmark) and ``full`` (the jobs/ entrypoints).
"""
from __future__ import annotations

import os

import pandas as pd
from pyspark.sql import SparkSession

from ..bench_data import Scenario
from ..bench_data.chasebench import ont256, stb128
from ..bench_data.lubm import lubm
from ..bench_data.ontologies import claros, dbpedia, reactome, uobm
from ..bench_data.rdfs_data import lubm_triples, yago_lite
from .runners import run_engine, run_linear_tg

SCALES = {
    "test": dict(lubm_u=1, uobm=3, dbpedia=1200, claros=240, reactome=50,
                 stb=60, ont=90, rdfs_lubm=1, yago=600),
    "bench": dict(lubm_u=2, uobm=4, dbpedia=2500, claros=500, reactome=100,
                  stb=120, ont=180, rdfs_lubm=2, yago=1500),
    "full": dict(lubm_u=8, uobm=8, dbpedia=8000, claros=1500, reactome=300,
                 stb=300, ont=500, rdfs_lubm=4, yago=4000),
}


def linear_scenarios(scale: str) -> list[Scenario]:
    c = SCALES[scale]
    return [
        lubm("LI", c["lubm_u"]),
        uobm("LI", c["uobm"]),
        dbpedia("LI", c["dbpedia"]),
        claros("LI", c["claros"]),
        reactome(c["reactome"]),
    ]


def datalog_scenarios(scale: str) -> list[Scenario]:
    c = SCALES[scale]
    return [
        lubm("L", c["lubm_u"]),
        lubm("LE", c["lubm_u"]),
        uobm("L", c["uobm"]),
        dbpedia("L", c["dbpedia"]),
        claros("L", c["claros"]),
        claros("LE", c["claros"]),
    ]


def chasebench_scenarios(scale: str) -> list[Scenario]:
    c = SCALES[scale]
    return [stb128(c["stb"]), ont256(c["ont"])]


def rdfs_scenarios(scale: str) -> list[Scenario]:
    c = SCALES[scale]
    return [lubm_triples(c["rdfs_lubm"]), yago_lite(c["yago"])]


def _emit(df: pd.DataFrame, name: str) -> pd.DataFrame:
    os.makedirs("results", exist_ok=True)
    df.to_csv(os.path.join("results", f"{name}.csv"), index=False)
    print(f"\n== {name} ==")
    print(df.to_string(index=False))
    return df


# ------------------------------------------------------------- Table 1

def table1(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """Benchmark statistics: #rules, #EDB facts, #IDB facts derived."""
    rows = []
    for sc in (
        linear_scenarios(scale)
        + datalog_scenarios(scale)
        + chasebench_scenarios(scale)
        + rdfs_scenarios(scale)
    ):
        engine = "glog-noopt" if not sc.program.is_datalog else "glog-mr"
        r = run_engine(spark, engine, sc)
        rows.append(
            dict(
                scenario=sc.name,
                n_rules=sc.n_rules,
                n_edb=sc.n_edb,
                n_idb=r.derived,
                idb_pct=round(100.0 * r.derived / sc.n_edb, 1),
            )
        )
    return _emit(pd.DataFrame(rows), "table1_stats")


# ------------------------------------------------------------- Table 2

def table2(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """Linear scenarios: chase engines vs TG-guided reasoning."""
    rows = []
    for sc in linear_scenarios(scale):
        row: dict = dict(scenario=sc.name)
        for eng in ("vlog", "rdfox", "com"):
            r = run_engine(spark, eng, sc)
            row[f"{eng}_s"] = r.wall_s
            row[f"{eng}_derived"] = r.derived
        g = run_linear_tg(spark, sc)
        row.update(
            glog_comp_s=g.extra["comp_s"],
            glog_reason_s=g.extra["reason_s"],
            glog_wo_cleaning_s=g.extra["total_wo_cleaning_s"],
            glog_w_cleaning_s=g.extra["total_w_cleaning_s"],
            glog_derived=g.derived,
            tg_nodes=g.tg_nodes,
            tg_edges=g.tg_edges,
            tg_depth=g.tg_depth,
        )
        rows.append(row)
    return _emit(pd.DataFrame(rows), "table2_linear")


# ------------------------------------------------------------- Table 3

def table3(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """Datalog scenarios: runtimes incl. GLog optimization variants."""
    rows = []
    for sc in datalog_scenarios(scale):
        row: dict = dict(scenario=sc.name)
        for eng in ("vlog", "rdfox", "com", "glog-noopt", "glog-m", "glog-mr"):
            r = run_engine(spark, eng, sc)
            row[f"{eng}_s"] = r.wall_s
            if eng == "glog-mr":
                row.update(
                    derived=r.derived,
                    tg_nodes=r.tg_nodes,
                    tg_edges=r.tg_edges,
                    tg_depth=r.tg_depth,
                )
        rows.append(row)
    return _emit(pd.DataFrame(rows), "table3_datalog")


# ------------------------------------------------------------- Table 4

def table4(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """ChaseBench (existential, non-linear): optimizations not applicable."""
    rows = []
    for sc in chasebench_scenarios(scale):
        row: dict = dict(scenario=sc.name)
        for eng in ("vlog", "rdfox", "com", "glog-noopt"):
            r = run_engine(spark, eng, sc)
            row[f"{eng}_s"] = r.wall_s
            row[f"{eng}_derived"] = r.derived
            if eng == "glog-noopt":
                row.update(
                    tg_nodes=r.tg_nodes, tg_edges=r.tg_edges, tg_depth=r.tg_depth
                )
        rows.append(row)
    return _emit(pd.DataFrame(rows), "table4_chasebench")


# ------------------------------------------------------------- Table 5

def table5(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """#Triggers on the Datalog scenarios (VLog vs GLog variants)."""
    rows = []
    for sc in datalog_scenarios(scale):
        row: dict = dict(scenario=sc.name)
        for eng in ("vlog", "glog-noopt", "glog-m", "glog-mr"):
            r = run_engine(spark, eng, sc, count_triggers=True)
            row[f"{eng}_triggers"] = r.triggers
        rows.append(row)
    return _emit(pd.DataFrame(rows), "table5_triggers")


# ------------------------------------------------------------- Table 6

def table6(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """RDFS (ρDF) scenarios: WebPIE-like / Inferray-like vs GLog."""
    rows = []
    for sc in rdfs_scenarios(scale):
        row: dict = dict(scenario=sc.name)
        for eng in ("webpie", "inferray", "glog-mr"):
            r = run_engine(spark, eng, sc)
            row[f"{eng}_s"] = r.wall_s
            row[f"{eng}_derived"] = r.derived
            if eng == "glog-mr":
                row.update(
                    tg_nodes=r.tg_nodes, tg_edges=r.tg_edges, tg_depth=r.tg_depth
                )
        rows.append(row)
    return _emit(pd.DataFrame(rows), "table6_rdfs")


# ------------------------------------------------------------- Table 7

def table7(
    spark: SparkSession, sizes: list[int] | None = None
) -> pd.DataFrame:
    """Scalability: LUBM-L with growing #universities (GLog m+r)."""
    rows = []
    for u in sizes or [2, 4, 8, 16, 32, 64]:
        sc = lubm("L", u)
        r = run_engine(spark, "glog-mr", sc)
        rows.append(
            dict(
                universities=u,
                n_edb=sc.n_edb,
                runtime_s=r.wall_s,
                derived=r.derived,
                rss_mb=r.rss_mb,
            )
        )
    return _emit(pd.DataFrame(rows), "table7_scalability")


# ------------------------------------------------------------- Table 8

def table8(spark: SparkSession, scale: str = "test") -> pd.DataFrame:
    """(a) #triggers on the linear scenarios (VLog vs GLog); (b) cost of
    the m / r optimizations on the Datalog scenarios."""
    rows = []
    for sc in linear_scenarios(scale):
        v = run_engine(spark, "vlog", sc, count_triggers=True)
        g = run_linear_tg(spark, sc)
        rows.append(
            dict(part="a", scenario=sc.name, vlog_triggers=v.triggers,
                 glog_triggers=g.triggers, m_cost_s=None, ruleexec_apps=None)
        )
    for sc in datalog_scenarios(scale):
        r = run_engine(spark, "glog-mr", sc)
        rows.append(
            dict(part="b", scenario=sc.name, vlog_triggers=None,
                 glog_triggers=None,
                 m_cost_s=r.extra.get("minDatalog_s"),
                 ruleexec_apps=r.extra.get("ruleExec_applications"))
        )
    return _emit(pd.DataFrame(rows), "table8_opts")
