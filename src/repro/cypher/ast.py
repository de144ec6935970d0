"""AST for the openCypher fragment.

A :class:`Query` is MATCH (comma-separated path patterns, optionally named)
+ optional WHERE + optional UNWIND nodes(path) + RETURN [DISTINCT]. WHERE
is a conjunction whose top-level conjuncts may be boolean comparison
expressions or ``NOT EXISTS { pattern }`` terms (pattern negation).

Constructs the paper excludes from the maintainable fragment (ORDER BY /
SKIP / LIMIT, list literals, aggregation, OPTIONAL MATCH, WITH) are
*parsed far enough to be rejected* with an explanatory
:class:`UnsupportedCypherError` naming the paper's restriction.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import List, Optional, Tuple, Union

from repro.algebra.expr import Expr


class UnsupportedCypherError(ValueError):
    """Query uses a construct outside the incrementally-maintainable fragment."""


@dataclass(frozen=True)
class NodePattern:
    """``(var:Label)`` — either part optional."""

    var: Optional[str]
    label: Optional[str]


@dataclass(frozen=True)
class RelPattern:
    """``-[var:TYPE*min..max]->`` (or ``<-…-``).

    ``min_hops``/``max_hops`` are (1, 1) for plain relationships;
    ``max_hops`` may be ``inf``. ``direction`` is 'out' for ``-…->`` and
    'in' for ``<-…-`` (relative to the textual left node).
    """

    var: Optional[str]
    edge_type: Optional[str]
    direction: str
    min_hops: int = 1
    max_hops: float = 1


@dataclass(frozen=True)
class PathPattern:
    """One comma-separated MATCH part: nodes interleaved with relationships."""

    path_var: Optional[str]
    nodes: Tuple[NodePattern, ...]
    rels: Tuple[RelPattern, ...]

    def __post_init__(self):
        assert len(self.nodes) == len(self.rels) + 1


@dataclass(frozen=True)
class NotExists:
    """``NOT EXISTS { patterns }`` — WHERE-level pattern negation."""

    patterns: Tuple[PathPattern, ...]


@dataclass(frozen=True)
class Where:
    """Top-level conjunction: scalar predicates + NOT EXISTS terms."""

    predicates: Tuple[Expr, ...]
    not_exists: Tuple[NotExists, ...]


@dataclass(frozen=True)
class Unwind:
    """``UNWIND nodes(path_var) AS out_var``."""

    path_var: str
    out_var: str


@dataclass(frozen=True)
class ReturnItem:
    expr: Expr  # Attr (variable / path) or PropAccess
    alias: str


@dataclass(frozen=True)
class Query:
    patterns: Tuple[PathPattern, ...]
    where: Optional[Where]
    unwind: Optional[Unwind]
    distinct: bool
    items: Tuple[ReturnItem, ...]
