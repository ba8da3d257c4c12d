"""Cross-engine equivalence on Datalog programs (paper Theorem 24 and the
fact that all chase variants coincide on Datalog): for every case, the
driver-side reference chase, both Spark chase baselines, and every TGmat
variant must produce exactly the same IDB facts."""
import duckdb
import pytest

from repro.core.chase_small import chase
from repro.core.tgmat import tgmat
from repro.engine.chase import naive_chase, seminaive_chase
from repro.engine.facts import FactStore

from tests.helpers import DATALOG_CASES, prog

ENGINES = ["seminaive", "naive", "glog-noopt", "glog-m", "glog-mr"]


@pytest.fixture(scope="module")
def results(spark):
    """Run every engine on every case once; tests assert over the cache."""
    out = {}
    for name, (text, base) in sorted(DATALOG_CASES.items()):
        p = prog(text)
        ref = chase(p, set(base))
        store = FactStore.from_facts(spark, base)
        store.register_arities(p.arities)
        runs = {}
        s, st = seminaive_chase(spark, p, store, count_triggers=True)
        runs["seminaive"] = (s.to_fact_set(p.idb), st)
        s, st = naive_chase(spark, p, store, count_triggers=True)
        runs["naive"] = (s.to_fact_set(p.idb), st)
        for eng, (m, r) in {
            "glog-noopt": (False, False),
            "glog-m": (True, False),
            "glog-mr": (True, True),
        }.items():
            res = tgmat(
                spark, p, store, use_min=m, use_ruleexec=r, count_triggers=True
            )
            runs[eng] = (res.store.to_fact_set(p.idb), res.stats)
        out[name] = (p, {f for f in ref.facts if f[0] in p.idb}, runs)
    return out


@pytest.mark.parametrize("name", sorted(DATALOG_CASES))
@pytest.mark.parametrize("engine", ENGINES)
def test_engine_matches_reference(results, name, engine):
    _, ref, runs = results[name]
    facts, _ = runs[engine]
    assert facts == ref


@pytest.mark.parametrize("name", sorted(DATALOG_CASES))
def test_trigger_ordering_naive_worst(results, name):
    """The naive chase re-enumerates the full instance every round — it
    never performs fewer trigger computations than semi-naive."""
    _, _, runs = results[name]
    assert runs["naive"][1].triggers >= runs["seminaive"][1].triggers


@pytest.mark.parametrize("name", sorted(DATALOG_CASES))
def test_trigger_ordering_tg_partitioning(results, name):
    """TG delta-partitioning (disjoint decomposition) never enumerates
    more triggers than the overlapping semi-naive expansion (paper C4)."""
    _, _, runs = results[name]
    assert runs["glog-noopt"][1].triggers <= runs["seminaive"][1].triggers


@pytest.mark.parametrize("name", sorted(DATALOG_CASES))
def test_minDatalog_never_increases_triggers(results, name):
    _, _, runs = results[name]
    assert runs["glog-m"][1].triggers <= runs["glog-noopt"][1].triggers


@pytest.mark.parametrize("name", sorted(DATALOG_CASES))
def test_tg_sizes_reported(results, name):
    _, _, runs = results[name]
    st = runs["glog-mr"][1]
    assert st.tg_nodes > 0 and st.tg_depth >= 0
    assert runs["glog-m"][1].tg_nodes <= runs["glog-noopt"][1].tg_nodes


def test_tc_against_duckdb_recursive_cte(spark, results):
    """Transitive closure checked against an independent SQL engine."""
    p, _, runs = results["tc_dag"]
    facts, _ = runs["glog-mr"]
    got = sorted(args for pred, args in facts if pred == "R")
    con = duckdb.connect()
    con.execute(
        "CREATE TABLE e(s TEXT, t TEXT); INSERT INTO e VALUES "
        "('a','b'),('a','c'),('b','d'),('c','d'),('d','e')"
    )
    want = sorted(
        map(
            tuple,
            con.execute(
                """
        WITH RECURSIVE r(s, t) AS (
            SELECT s, t FROM e
            UNION SELECT r.s, e.t FROM r JOIN e ON r.t = e.s
        ) SELECT s, t FROM r
        """
            ).fetchall(),
        )
    )
    con.close()
    assert got == want


@pytest.mark.parametrize("name", ["tc_chain", "hierarchy"])
def test_rounds_match_reference(results, name):
    p, _, runs = results[name]
    ref = chase(p, set(DATALOG_CASES[name][1]))
    # breadth-first engines need the same number of productive rounds
    # (+1 terminating round with no derivation)
    assert runs["seminaive"][1].rounds in (ref.rounds, ref.rounds + 1)
    assert runs["glog-noopt"][1].rounds in (ref.rounds, ref.rounds + 1)
