"""Term taxonomy unit tests."""
import pytest

from repro.core import terms


@pytest.mark.parametrize("t", ["X", "Y1", "Zvar", "ABC"])
def test_vars(t):
    assert terms.is_var(t) and not terms.is_null(t) and not terms.is_const(t)


@pytest.mark.parametrize("t", ["c1", "red", "u0d1p2", "42", "⊥0", "felix"])
def test_consts(t):
    assert terms.is_const(t) and not terms.is_var(t) and not terms.is_null(t)


@pytest.mark.parametrize("t", ["_:n0", "_:n12_Z_7", "_:sk_r1_Z_abc"])
def test_nulls(t):
    assert terms.is_null(t) and not terms.is_var(t) and not terms.is_const(t)


def test_fresh_null_unique():
    a, b = terms.fresh_null(), terms.fresh_null()
    assert a != b and terms.is_null(a) and terms.is_null(b)


def test_skolem_deterministic():
    assert terms.skolem("r1", "Z", ("a", "b")) == terms.skolem("r1", "Z", ("a", "b"))


@pytest.mark.parametrize(
    "k1,k2",
    [
        (("r1", "Z", ("a",)), ("r2", "Z", ("a",))),
        (("r1", "Z", ("a",)), ("r1", "W", ("a",))),
        (("r1", "Z", ("a",)), ("r1", "Z", ("b",))),
        (("r1", "Z", ("a", "b")), ("r1", "Z", ("ab",))),
    ],
)
def test_skolem_distinct(k1, k2):
    assert terms.skolem(*k1) != terms.skolem(*k2)


def test_empty_string_not_var():
    assert not terms.is_var("")
