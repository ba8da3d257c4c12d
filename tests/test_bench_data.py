"""Scenario generator tests: determinism, structure, program classes."""
import pytest

from repro.bench_data.chasebench import ont256, stb128
from repro.bench_data.lubm import PROGRAMS, lubm, lubm_tables
from repro.bench_data.ontologies import claros, dbpedia, reactome, uobm
from repro.bench_data.rdfs_data import lubm_triples, rho_df_program, yago_lite


# ----------------------------------------------------------------- LUBM

def test_lubm_tables_deterministic():
    a, b = lubm_tables(2, seed=0), lubm_tables(2, seed=0)
    for k in a:
        assert a[k].equals(b[k])


def test_lubm_scales_linearly():
    n1 = sum(len(t) for t in lubm_tables(1).values())
    n4 = sum(len(t) for t in lubm_tables(4).values())
    assert abs(n4 - 4 * n1) < 0.05 * n4


def test_lubm_facts_per_university_order():
    n1 = sum(len(t) for t in lubm_tables(1).values())
    assert 500 <= n1 <= 2500  # ~1.1k facts / university (scaled-down 132k)


@pytest.mark.parametrize("variant", ["LI", "L", "LE"])
def test_lubm_programs_parse(variant):
    sc = lubm(variant, 1)
    assert sc.n_rules > 10 and sc.program.is_datalog


def test_lubm_li_linear():
    assert lubm("LI", 1).program.is_linear


def test_lubm_program_inclusion():
    li, l, le = (set(PROGRAMS[v].split("\n")) for v in ("LI", "L", "LE"))
    assert li < l < le  # LI ⊂ L ⊂ LE (paper Section 7.1)


def test_lubm_edb_never_in_heads():
    p = lubm("LE", 1).program
    assert not any(r.head.pred in p.edb for r in p.rules)


def test_lubm_every_table_is_edb():
    sc = lubm("L", 1)
    assert set(sc.tables) <= sc.program.edb


# ----------------------------------------------------------------- UOBM

def test_uobm_li_linear_and_l_recursive():
    assert uobm("LI", 2).program.is_linear
    pl = uobm("L", 2).program
    assert not pl.is_linear and pl.is_datalog


def test_uobm_cross_links_exist():
    sc = uobm("L", 3)
    assert "partOfOrg" in sc.tables and len(sc.tables["partOfOrg"]) >= 2


# -------------------------------------------------------------- DBpedia

def test_dbpedia_wide_program():
    sc = dbpedia("LI", 500)
    assert sc.n_rules > 100 and sc.program.is_linear


def test_dbpedia_l_has_joins():
    p = dbpedia("L", 500).program
    assert any(len(r.body) > 1 for r in p.rules)


def test_dbpedia_fact_count():
    sc = dbpedia("LI", 2000)
    assert abs(sc.n_edb - 2000) <= 5


# --------------------------------------------------------------- Claros

def test_claros_deep_linear_chain():
    p = claros("LI", 100).program
    assert p.is_linear
    assert sum(1 for r in p.rules if r.head.pred.startswith("K")) >= 20


def test_claros_variants():
    assert not claros("L", 100).program.is_linear
    le = claros("LE", 100).program
    assert any("Conn" == r.head.pred and len(r.body) == 1 and
               r.body[0].pred == "Conn" for r in le.rules)  # symmetric rule


def test_claros_clusters_bound_closure():
    sc = claros("L", 120, cluster=10)
    # relatedTo chains never cross cluster boundaries
    for s, t in sc.tables["relatedTo"].itertuples(index=False):
        assert int(s[1:]) // 10 == int(t[1:]) // 10


# ------------------------------------------------------------- Reactome

def test_reactome_existential_linear():
    p = reactome(10).program
    assert p.is_linear and not p.is_datalog
    assert any(r.is_existential for r in p.rules)


def test_reactome_every_pathway_has_parts():
    sc = reactome(5)
    assert set(sc.tables["partOf"]["a1"]) == set(sc.tables["pathway"]["a0"])


# ----------------------------------------------------------- ChaseBench

def test_stb128_existential_nonlinear_recursive():
    p = stb128(50).program
    assert not p.is_datalog and not p.is_linear
    assert any(r.head.pred in {a.pred for a in r.body} for r in p.rules)


def test_ont256_extends_stb():
    assert ont256(50).n_rules > stb128(50).n_rules


def test_chasebench_deterministic():
    a, b = stb128(40, seed=7), stb128(40, seed=7)
    for k in a.tables:
        assert a.tables[k].equals(b.tables[k])


# ----------------------------------------------------------------- RDFS

def test_rho_df_program_shape():
    p = rho_df_program()
    assert p.edb == {"t"} and p.idb == {"T"} and p.is_datalog
    assert len(p) == 7


def test_lubm_triples_single_relation():
    sc = lubm_triples(1)
    assert set(sc.tables) == {"t"} and len(sc.tables["t"].columns) == 3


def test_lubm_triples_schema_present():
    t = lubm_triples(1).tables["t"]
    preds = set(t["a1"])
    assert {"sc", "sp", "dom", "rng", "type"} <= preds


def test_yago_taxonomy_depth():
    t = yago_lite(100, depth=4, branch=2).tables["t"]
    sc_triples = t[t["a1"] == "sc"]
    assert len(sc_triples) == 2 + 4 + 8 + 16  # full binary tree levels


def test_yago_instances_typed():
    t = yago_lite(50).tables["t"]
    assert (t["a1"] == "type").sum() == 50
