"""Provided substrate sanity: synth_data generators and the DuckDB oracle."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    assert a.equals(b)


def test_orders_keys_unique(spark):
    o = synth_data.orders(spark, sf=0.001)
    assert o.count() == o.select("o_orderkey").distinct().count()


def test_zipf_keys_skewed(spark):
    z = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    top = z["k"].value_counts().iloc[0]
    assert top > 5000 / 100 * 3  # far above uniform share


def test_uniform_keys_range(spark):
    u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert u["k"].between(1, 50).all()


def test_oracle_accepts_matching_join(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_custkey")
        .count()
        .selectExpr("o_custkey AS c", "count AS n")
    )
    assert_equivalent(
        got,
        "SELECT o.o_custkey AS c, count(*) AS n FROM li JOIN o "
        "ON li.l_orderkey = o.o_orderkey GROUP BY o.o_custkey",
        li=li,
        o=o,
    )


def test_oracle_rejects_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").count().selectExpr(
        "l_returnflag AS f", "count + 1 AS n"  # deliberately wrong
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag AS f, count(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_rejects_column_mismatch(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").count()
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got, "SELECT l_returnflag AS f, count(*) AS n FROM li GROUP BY 1", li=li
        )
