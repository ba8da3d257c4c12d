"""Uniform entry points: run one engine over one scenario.

Engine names follow the paper's systems (DESIGN.md §4 maps each to its
simulation): ``vlog`` (semi-naive restricted chase, per-rule filtering),
``rdfox`` (naive skolem chase), ``com`` (naive + per-round re-sort),
``webpie``/``inferray`` (ρDF baselines), ``glog-noopt``/``glog-m``/
``glog-mr`` (TGmat with optimizations off/m/m+r), and ``glog-linear``
(tglinear + minLinear + Definition 5 evaluation).
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..bench_data import Scenario
from ..core.tg_exec import eval_tg_spark
from ..core.tg_linear import min_linear, tglinear
from ..core.tgmat import tgmat
from ..engine.chase import naive_chase, seminaive_chase
from ..engine.facts import FactStore
from ..engine.rdfs import inferray_like, webpie_like
from .metrics import RunResult, peak_rss_mb


def base_store(spark: SparkSession, scenario: Scenario) -> FactStore:
    store = FactStore.from_pandas(spark, scenario.tables)
    store.register_arities(scenario.program.arities)
    store.checkpoint()
    return store


def run_engine(
    spark: SparkSession,
    engine: str,
    scenario: Scenario,
    *,
    count_triggers: bool = False,
    max_rounds: int = 100,
) -> RunResult:
    base = base_store(spark, scenario)
    kw = dict(count_triggers=count_triggers, max_rounds=max_rounds)
    if engine == "vlog":
        _, stats = seminaive_chase(spark, scenario.program, base, **kw)
    elif engine == "rdfox":
        _, stats = naive_chase(spark, scenario.program, base, **kw)
    elif engine == "com":
        _, stats = naive_chase(spark, scenario.program, base, extra_sort=True, **kw)
    elif engine == "webpie":
        _, stats = webpie_like(spark, scenario.program, base, **kw)
    elif engine == "inferray":
        _, stats = inferray_like(spark, scenario.program, base, **kw)
    elif engine.startswith("glog"):
        use_min = engine in ("glog-m", "glog-mr")
        use_r = engine == "glog-mr"
        res = tgmat(
            spark, scenario.program, base, use_min=use_min, use_ruleexec=use_r, **kw
        )
        stats = res.stats
    else:
        raise ValueError(f"unknown engine {engine!r}")
    return RunResult(
        scenario=scenario.name,
        engine=engine,
        wall_s=round(stats.wall_s, 3),
        rounds=stats.rounds,
        triggers=stats.triggers if count_triggers else -1,
        derived=stats.derived,
        rss_mb=round(peak_rss_mb(), 1),
        tg_nodes=stats.tg_nodes,
        tg_edges=stats.tg_edges,
        tg_depth=stats.tg_depth,
        extra=dict(stats.opt_cost_s),
    )


def run_linear_tg(
    spark: SparkSession, scenario: Scenario, *, count_triggers: bool = True
) -> RunResult:
    """The GLog columns of Table 2: TG computation time (tglinear +
    minLinear), reasoning time (Definition 5 without any redundancy
    filtering), and the total with collective cleaning at the end."""
    base = base_store(spark, scenario)
    t0 = time.perf_counter()
    g = tglinear(scenario.program)
    g = min_linear(g, scenario.program)
    comp_s = time.perf_counter() - t0
    _, raw = eval_tg_spark(
        spark, g, scenario.program, base, cleaning=False, count_triggers=count_triggers
    )
    _, cleaned = eval_tg_spark(
        spark, g, scenario.program, base, cleaning=True, count_triggers=False
    )
    return RunResult(
        scenario=scenario.name,
        engine="glog-linear",
        wall_s=round(comp_s + raw.wall_s, 3),  # "w/o cleaning" total
        rounds=raw.rounds,
        triggers=raw.triggers,
        derived=cleaned.derived,
        rss_mb=round(peak_rss_mb(), 1),
        tg_nodes=g.n_nodes,
        tg_edges=g.n_edges,
        tg_depth=g.graph_depth,
        extra={
            "comp_s": round(comp_s, 4),
            "reason_s": round(raw.wall_s, 3),
            "total_wo_cleaning_s": round(comp_s + raw.wall_s, 3),
            "total_w_cleaning_s": round(comp_s + cleaned.wall_s, 3),
            "derived_wo_cleaning": raw.derived,
        },
    )
