"""Graph relational algebra (GRA) operator trees — compilation step 1.

GRA (after [Marton/Szárnyas/Varró, ADBIS'17] = paper ref 20) extends
relational algebra with two graph-specific operators:

* :class:`GetVertices` — the nullary ○_(v:V) operator, a base relation of
  vertices with a label;
* :class:`ExpandOut` — the unary ↑ operator navigating one edge (or, with
  ``max_hops`` ≠ 1, a transitive ``*min..max`` pattern producing a path).

Plus the classical :class:`Selection` / :class:`Projection`, and
:class:`AllDifferent`, which enforces Cypher's edge-isomorphism (all
relationship variables of one MATCH bind distinct edges). GRA trees still
reference properties via ``PropAccess`` expressions; they are made explicit
(unnest) only in the NRA stage.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import List, Optional, Sequence, Tuple, Union

from repro.algebra.expr import Expr

#: Marker for an unbounded upper hop count in transitive patterns.
UNBOUNDED = math.inf


@dataclass(frozen=True)
class GetVertices:
    """○_(var:label) — all vertices with ``label`` (or any, if None)."""

    var: str
    label: Optional[str]


@dataclass(frozen=True)
class ExpandOut:
    """↑ — navigate from ``src_var`` over ``edge_type`` to ``dst_var``.

    ``direction='out'`` follows edges source→target, ``'in'`` the reverse.
    ``min_hops``/``max_hops`` of (1, 1) is a plain expand; anything else is
    the transitive variant (↑*) and binds ``path_var`` (auto-named when the
    query does not name the path). ``edge_var`` binds the traversed edge id
    for single hops only (transitive patterns own their edges via the path).
    """

    child: "GraNode"
    src_var: str
    dst_var: str
    dst_label: Optional[str]
    edge_type: Optional[str]
    direction: str = "out"
    min_hops: int = 1
    max_hops: float = 1
    edge_var: Optional[str] = None
    path_var: Optional[str] = None

    @property
    def is_transitive(self) -> bool:
        return not (self.min_hops == 1 and self.max_hops == 1)


@dataclass(frozen=True)
class Selection:
    """σ_pred(child)."""

    child: "GraNode"
    predicate: Expr


@dataclass(frozen=True)
class Projection:
    """π(child) with named output items ``(expr, alias)``."""

    child: "GraNode"
    items: Tuple[Tuple[Expr, str], ...]


@dataclass(frozen=True)
class AllDifferent:
    """Edge-isomorphism guard: scalar edge vars and path edge-lists disjoint."""

    child: "GraNode"
    edge_vars: Tuple[str, ...]
    path_vars: Tuple[str, ...]


@dataclass(frozen=True)
class NaturalJoin:
    """⋈ — combines comma-separated MATCH parts on their shared variables."""

    left: "GraNode"
    right: "GraNode"


@dataclass(frozen=True)
class AntiJoin:
    """▷ — NOT EXISTS { pattern }: rows of ``left`` with no match in ``right``."""

    left: "GraNode"
    right: "GraNode"


@dataclass(frozen=True)
class Distinct:
    """δ — RETURN DISTINCT (bag → set)."""

    child: "GraNode"


@dataclass(frozen=True)
class UnwindPath:
    """UNWIND nodes(path_var) AS out_var — order is lost (paper §4, ORD)."""

    child: "GraNode"
    path_var: str
    out_var: str


GraNode = Union[
    GetVertices,
    ExpandOut,
    Selection,
    Projection,
    AllDifferent,
    NaturalJoin,
    AntiJoin,
    Distinct,
    UnwindPath,
]


def schema(node: GraNode) -> List[str]:
    """Logical output attributes of a GRA node (path var = one attribute)."""
    if isinstance(node, GetVertices):
        return [node.var]
    if isinstance(node, ExpandOut):
        out = list(schema(node.child))
        if node.src_var not in out:
            raise ValueError(f"expand source {node.src_var!r} not in scope {out}")
        for v in (node.edge_var, node.dst_var, node.path_var):
            if v is not None:
                if v in out:
                    raise ValueError(f"variable {v!r} already bound")
                out.append(v)
        return out
    if isinstance(node, (Selection, AllDifferent, Distinct)):
        return schema(node.child)
    if isinstance(node, Projection):
        return [alias for _, alias in node.items]
    if isinstance(node, NaturalJoin):
        ls, rs = schema(node.left), schema(node.right)
        return ls + [a for a in rs if a not in ls]
    if isinstance(node, AntiJoin):
        return schema(node.left)
    if isinstance(node, UnwindPath):
        return schema(node.child) + [node.out_var]
    raise TypeError(f"not a GRA node: {node!r}")


def children(node: GraNode) -> Sequence[GraNode]:
    if isinstance(node, GetVertices):
        return ()
    if isinstance(node, (NaturalJoin, AntiJoin)):
        return (node.left, node.right)
    return (node.child,)
