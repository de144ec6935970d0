"""Scalar expression AST shared by all three algebra layers (GRA/NRA/FRA).

Expressions appear in selections and projections. Before the NRA stage,
property reads are :class:`PropAccess` nodes (``p.lang``); the GRA→NRA
rewrite replaces them with plain :class:`Attr` references to unnested
attributes (``p__lang``), and schema inference finally pushes those down to
the leaf scans (DESIGN.md §1 steps 2–3).

Typing rule (schema-free graphs store property values as strings): a
comparison with a numeric literal casts both sides to double; comparisons
between two attributes, or with a string literal, compare as strings. NULL
(missing property) never satisfies a comparison, matching Cypher.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Union


@dataclass(frozen=True)
class Attr:
    """Reference to an attribute of the current relation by name."""

    name: str


@dataclass(frozen=True)
class PropAccess:
    """``var.key`` — read property ``key`` of the vertex/edge bound to ``var``."""

    var: str
    key: str


@dataclass(frozen=True)
class Lit:
    """A literal: str, int, float or bool."""

    value: Union[str, int, float, bool]


@dataclass(frozen=True)
class Cmp:
    """Binary comparison; ``op`` ∈ {=, <>, <, <=, >, >=}."""

    op: str
    left: "Expr"
    right: "Expr"


@dataclass(frozen=True)
class And:
    left: "Expr"
    right: "Expr"


@dataclass(frozen=True)
class Or:
    left: "Expr"
    right: "Expr"


@dataclass(frozen=True)
class Not:
    operand: "Expr"


Expr = Union[Attr, PropAccess, Lit, Cmp, And, Or, Not]

_CMP_OPS = {"=", "<>", "<", "<=", ">", ">="}


def validate(e: Expr) -> None:
    """Raise ValueError on malformed expressions (unknown comparison op)."""
    if isinstance(e, Cmp):
        if e.op not in _CMP_OPS:
            raise ValueError(f"unknown comparison operator {e.op!r}")
        validate(e.left)
        validate(e.right)
    elif isinstance(e, (And, Or)):
        validate(e.left)
        validate(e.right)
    elif isinstance(e, Not):
        validate(e.operand)
    elif isinstance(e, (Attr, PropAccess, Lit)):
        return
    else:
        raise ValueError(f"not an expression: {e!r}")


def prop_accesses(e: Expr) -> list:
    """All PropAccess nodes in ``e``, left-to-right (duplicates dropped)."""
    out: list = []

    def walk(x: Expr) -> None:
        if isinstance(x, PropAccess):
            if x not in out:
                out.append(x)
        elif isinstance(x, Cmp):
            walk(x.left)
            walk(x.right)
        elif isinstance(x, (And, Or)):
            walk(x.left)
            walk(x.right)
        elif isinstance(x, Not):
            walk(x.operand)

    walk(e)
    return out


def substitute_props(e: Expr, mapping: dict) -> Expr:
    """Replace each PropAccess with Attr(mapping[(var, key)])."""
    if isinstance(e, PropAccess):
        return Attr(mapping[(e.var, e.key)])
    if isinstance(e, Cmp):
        return Cmp(e.op, substitute_props(e.left, mapping), substitute_props(e.right, mapping))
    if isinstance(e, And):
        return And(substitute_props(e.left, mapping), substitute_props(e.right, mapping))
    if isinstance(e, Or):
        return Or(substitute_props(e.left, mapping), substitute_props(e.right, mapping))
    if isinstance(e, Not):
        return Not(substitute_props(e.operand, mapping))
    return e


def attrs_used(e: Expr) -> set:
    """Names of all Attr nodes referenced by ``e``."""
    out: set = set()

    def walk(x: Expr) -> None:
        if isinstance(x, Attr):
            out.add(x.name)
        elif isinstance(x, Cmp):
            walk(x.left)
            walk(x.right)
        elif isinstance(x, (And, Or)):
            walk(x.left)
            walk(x.right)
        elif isinstance(x, Not):
            walk(x.operand)

    walk(e)
    return out
