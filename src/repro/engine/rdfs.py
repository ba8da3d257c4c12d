"""ρDF baseline runners (paper Section 7.4).

Both baselines are fixed-rule RDFS materializers realized as chase
configurations over the shared substrate (DESIGN.md §4):

- WebPIE encoded materialization as iterated MapReduce jobs: every
  iteration re-scans the full triple set per rule and deduplicates in a
  sort phase → modeled as the naive chase with a per-round global re-sort;
- Inferray runs each rule on sorted in-memory columns with per-rule
  duplicate elimination → modeled as the semi-naive chase with per-rule
  filtering.

GLog runs the same ρDF program through TGmat (see harness.runners).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..core.rules import Program
from .chase import EngineStats, naive_chase, seminaive_chase
from .facts import FactStore


def webpie_like(
    spark: SparkSession, program: Program, base: FactStore, **kw
) -> tuple[FactStore, EngineStats]:
    store, stats = naive_chase(spark, program, base, extra_sort=True, **kw)
    stats.engine = "webpie"
    return store, stats


def inferray_like(
    spark: SparkSession, program: Program, base: FactStore, **kw
) -> tuple[FactStore, EngineStats]:
    store, stats = seminaive_chase(spark, program, base, **kw)
    stats.engine = "inferray"
    return store, stats
