"""Expression AST utility tests."""
import pytest

from repro.algebra import expr as ex
from repro.algebra.pretty import expr_str


def test_validate_ok():
    e = ex.And(ex.Cmp("=", ex.Attr("a"), ex.Lit(1)), ex.Not(ex.Cmp("<", ex.PropAccess("b", "x"), ex.Lit(2))))
    ex.validate(e)  # no raise


def test_validate_bad_op():
    with pytest.raises(ValueError, match="unknown comparison"):
        ex.validate(ex.Cmp("!=", ex.Attr("a"), ex.Lit(1)))


def test_validate_non_expr():
    with pytest.raises(ValueError, match="not an expression"):
        ex.validate("nope")  # type: ignore[arg-type]


def test_prop_accesses_dedup_ordered():
    e = ex.And(
        ex.Cmp("=", ex.PropAccess("a", "x"), ex.PropAccess("b", "y")),
        ex.Cmp("<", ex.PropAccess("a", "x"), ex.Lit(3)),
    )
    assert ex.prop_accesses(e) == [ex.PropAccess("a", "x"), ex.PropAccess("b", "y")]


def test_prop_accesses_none():
    assert ex.prop_accesses(ex.Cmp("=", ex.Attr("a"), ex.Lit(1))) == []


def test_substitute_props():
    e = ex.Or(
        ex.Cmp("=", ex.PropAccess("a", "x"), ex.Lit(1)),
        ex.Not(ex.Cmp("<>", ex.Attr("k"), ex.PropAccess("b", "y"))),
    )
    m = {("a", "x"): "a__x", ("b", "y"): "b__y"}
    out = ex.substitute_props(e, m)
    assert ex.prop_accesses(out) == []
    assert ex.attrs_used(out) == {"a__x", "b__y", "k"}


def test_attrs_used():
    e = ex.And(ex.Cmp("=", ex.Attr("p"), ex.Attr("q")), ex.Cmp("<", ex.Attr("p"), ex.Lit(0)))
    assert ex.attrs_used(e) == {"p", "q"}


@pytest.mark.parametrize(
    "e,s",
    [
        (ex.Attr("a"), "a"),
        (ex.PropAccess("a", "x"), "a.x"),
        (ex.Lit(3), "3"),
        (ex.Lit("s"), "'s'"),
        (ex.Cmp("<=", ex.Attr("a"), ex.Lit(1)), "(a <= 1)"),
        (ex.Not(ex.Cmp("=", ex.Attr("a"), ex.Attr("b"))), "(NOT (a = b))"),
        (
            ex.Or(ex.Cmp("=", ex.Attr("a"), ex.Lit(1)), ex.Cmp("=", ex.Attr("b"), ex.Lit(2))),
            "((a = 1) OR (b = 2))",
        ),
    ],
)
def test_expr_str(e, s):
    assert expr_str(e) == s
