"""Structural tests for the table harness (scales, scenario sets) — the
full builders are exercised by jobs/ and benchmarks/, not here."""
import pytest

from repro.harness import tables


def test_scales_have_all_knobs():
    keys = set(tables.SCALES["test"])
    for scale in ("bench", "full"):
        assert set(tables.SCALES[scale]) == keys


def test_scales_monotone():
    for k in tables.SCALES["test"]:
        assert (
            tables.SCALES["test"][k]
            <= tables.SCALES["bench"][k]
            <= tables.SCALES["full"][k]
        )


def test_linear_scenarios_are_linear():
    for sc in tables.linear_scenarios("test"):
        assert sc.program.is_linear, sc.name


def test_datalog_scenarios_are_datalog():
    for sc in tables.datalog_scenarios("test"):
        assert sc.program.is_datalog and not sc.program.is_linear, sc.name


def test_chasebench_scenarios_existential():
    for sc in tables.chasebench_scenarios("test"):
        assert not sc.program.is_datalog, sc.name


def test_rdfs_scenarios_triple_encoded():
    for sc in tables.rdfs_scenarios("test"):
        assert set(sc.tables) == {"t"}


def test_scenario_names_match_paper():
    names = [s.name for s in tables.linear_scenarios("test")]
    assert names == ["LUBM-LI", "UOBM-LI", "DBpedia-LI", "Claros-LI", "Reactome-LI"]
    names = [s.name for s in tables.datalog_scenarios("test")]
    assert names == [
        "LUBM-L", "LUBM-LE", "UOBM-L", "DBpedia-L", "Claros-L", "Claros-LE",
    ]


def test_emit_writes_csv(tmp_path, monkeypatch):
    import pandas as pd

    monkeypatch.chdir(tmp_path)
    df = pd.DataFrame([{"a": 1}])
    out = tables._emit(df, "t_test")
    assert (tmp_path / "results" / "t_test.csv").exists()
    assert out.equals(df)
