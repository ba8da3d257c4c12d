"""TG-guided reasoning over Spark for precomputed (linear) TGs.

Implements Definition 5: traverse the TG topologically; each node's facts
are its rule applied to the union of its parents' facts (the base instance
for root nodes); ``G(B)`` is the union of all node instances plus ``B``.

For linear rules every node is a filter+projection over its single
parent — Catalyst pipelines whole root-to-leaf chains into single stages
over the base relation, which is exactly the paper's *structure sharing*:
derived facts are never materialized unless the caller asks for them.

Two total-runtime modes mirror Table 2:
- ``cleaning=False``  ("w/o cleaning"): count raw rows per predicate, no
  redundancy filtering at all;
- ``cleaning=True``   ("w/ cleaning"): one collective pass per predicate at
  the end — global ``distinct`` plus removal of null-carrying facts that
  are subsumed by a null-free fact on their non-null positions (the
  deferred n-way filtering the paper contrasts with the chase's
  filter-after-every-rule).
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..engine.chase import EngineStats, _prepare
from ..engine.facts import FactStore
from ..engine.rule_exec import execute_rule
from .eg import EG, EGNode
from .rules import Program


def subsume_nulls(df: DataFrame) -> DataFrame:
    """Drop facts containing nulls that a null-free fact subsumes on every
    non-null position (pattern-level redundancy elimination; the general
    core computation is approximated by its by-far most common case)."""
    cols = df.columns
    zero = "0" * len(cols)
    mask = F.concat_ws(
        "",
        *[
            F.when(F.col(c).startswith("_:"), F.lit("1")).otherwise(F.lit("0"))
            for c in cols
        ],
    )
    d = df.withColumn("_mask", mask).localCheckpoint(eager=True)
    masks = [r[0] for r in d.select("_mask").distinct().collect()]
    null_free = d.where(F.col("_mask") == zero).drop("_mask")
    if set(masks) <= {zero}:
        return null_free
    parts = [null_free]
    for m in masks:
        if m == zero:
            continue
        part = d.where(F.col("_mask") == m).drop("_mask")
        on = [c for c, bit in zip(cols, m) if bit == "0"]
        if on:
            part = part.join(
                null_free.select(on).dropDuplicates(), on=on, how="left_anti"
            )
        elif not null_free.isEmpty():
            part = part.limit(0)
        parts.append(part)
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def eval_tg_spark(
    spark: SparkSession,
    g: EG,
    program: Program,
    base: FactStore,
    *,
    cleaning: bool = True,
    count_triggers: bool = False,
) -> tuple[FactStore, EngineStats]:
    """Definition 5 over Spark.  Returns the result store (IDB predicates
    hold the — optionally cleaned — union of node instances) and stats;
    ``stats.derived`` counts IDB rows under the selected mode and
    ``stats.triggers`` the total rule executions' bindings (equal to the
    raw derived rows for linear single-head rules)."""
    t0 = time.perf_counter()
    store = _prepare(spark, program, base)
    stats = EngineStats(engine="glog-linear")
    g.recompute_depths()
    node_df: dict[int, DataFrame] = {}
    per_pred: dict[str, list[DataFrame]] = {}
    for node in sorted(g.nodes, key=lambda n: n.depth):
        rule = node.rule
        if node.parents.get(0):
            parents = node.parents[0]
            src = node_df[parents[0].nid]
            for p in parents[1:]:
                src = src.unionByName(node_df[p.nid])
        else:
            src = store.df(rule.body[0].pred)
        # Definition 5 performs no satisfaction checks: existential rules
        # emit fresh nulls; redundancy is (optionally) removed at the end
        ex = execute_rule(
            rule,
            [src],
            variant="null" if rule.is_existential else "datalog",
            null_tag=f"tg_n{node.nid}",
            count_triggers=False,
        )
        stats.rule_execs += 1
        node_df[node.nid] = ex.head_df
        per_pred.setdefault(rule.head.pred, []).append(ex.head_df)

    for pred, dfs in sorted(per_pred.items()):
        u = dfs[0]
        for d in dfs[1:]:
            u = u.unionByName(d)
        if count_triggers:
            stats.triggers += u.count()
        if cleaning:
            u = subsume_nulls(u.dropDuplicates()).localCheckpoint(eager=True)
        stats.derived += u.count()
        store.set(pred, u)
    stats.rounds = g.graph_depth + 1
    stats.tg_nodes, stats.tg_edges, stats.tg_depth = g.sizes()
    stats.wall_s = time.perf_counter() - t0
    return store, stats
