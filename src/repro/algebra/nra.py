"""Nested relational algebra (NRA) operator trees — compilation steps 2–3.

The GRA→NRA rewrite (``repro.algebra.rewrite``) eliminates every expand-out
in favour of natural joins with the nullary :class:`GetEdges` operator ⇑
(transitive expands become :class:`TransitiveJoin` ⋈*), and makes property
reads explicit via the modified :class:`Unnest` operator μ_{v.key→attr},
which names the attribute(s) to unnest — required because property graphs
are schema-free (paper §4 step 2–3).

After schema inference (``repro.algebra.schema_inference``) the same node
classes form the FRA plan: :class:`Unnest` nodes are gone, and the leaf
scans carry ``props`` maps listing exactly the properties each operator
must emit (*minimal schema*). Leaves with ``include_properties=True`` model
the non-inferred baseline: they emit the whole nested ``properties`` map
(attribute ``<var>__props``) and Unnest stays in the tree (DESIGN.md T3).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import List, Mapping, Optional, Sequence, Tuple, Union

from repro.algebra.expr import Expr

UNBOUNDED = math.inf


def props_attr(var: str) -> str:
    """Physical attribute holding the full properties map of ``var``."""
    return f"{var}__props"


def prop_attr(var: str, key: str) -> str:
    """Canonical attribute name for property ``key`` of variable ``var``."""
    return f"{var}__{key}"


@dataclass(frozen=True)
class GetVertices:
    """○ — vertices with ``label``; emits ``var`` (+ requested properties)."""

    var: str
    label: Optional[str]
    props: Mapping[str, str] = field(default_factory=dict)  # key -> out attr
    include_properties: bool = False

    def output(self) -> List[str]:
        out = [self.var]
        out += list(self.props.values())
        if self.include_properties:
            out.append(props_attr(self.var))
        return out


@dataclass(frozen=True)
class GetEdges:
    """⇑ — triples (src_var, edge_var, dst_var) for each edge of ``edge_type``.

    Endpoint *label* constraints are not enforced here: the rewrite joins
    with :class:`GetVertices` scans instead, so that label changes propagate
    through ordinary join deltas in the IVM network.
    """

    src_var: str
    edge_var: str
    dst_var: str
    edge_type: Optional[str]
    direction: str = "out"  # 'in' swaps which endpoint binds src_var/dst_var
    props: Mapping[str, str] = field(default_factory=dict)  # edge props
    include_properties: bool = False

    def output(self) -> List[str]:
        out = [self.src_var, self.edge_var, self.dst_var]
        out += list(self.props.values())
        if self.include_properties:
            out.append(props_attr(self.edge_var))
        return out


@dataclass(frozen=True)
class NaturalJoin:
    """⋈ on all shared scalar variables (cartesian when none are shared)."""

    left: "NraNode"
    right: "NraNode"


@dataclass(frozen=True)
class AntiJoin:
    """▷ — rows of ``left`` with no matching row in ``right`` (NOT EXISTS)."""

    left: "NraNode"
    right: "NraNode"


@dataclass(frozen=True)
class TransitiveJoin:
    """⋈* — join ``left`` with the transitive closure of typed edges.

    Binds ``dst_var`` to reachable vertices and ``path_var`` to the atomic
    path (vertex list + edge list). Trail semantics: a path never repeats an
    edge. Endpoint labels are enforced by surrounding joins, intermediate
    vertices are unconstrained (Cypher semantics). ``min_hops=0`` admits the
    empty path binding ``dst_var = src_attr``.
    """

    left: "NraNode"
    src_attr: str
    dst_var: str
    path_var: str
    edge_type: Optional[str]
    direction: str = "out"
    min_hops: int = 1
    max_hops: float = UNBOUNDED


@dataclass(frozen=True)
class Unnest:
    """μ_{v.key→attr} — emit property ``key`` of each listed var as a column.

    Only present before schema inference (or in the no-pushdown baseline,
    where it reads from the ``<var>__props`` map emitted by the leaves).
    """

    child: "NraNode"
    items: Tuple[Tuple[str, str, str], ...]  # (var, key, out_attr)


@dataclass(frozen=True)
class Selection:
    child: "NraNode"
    predicate: Expr


@dataclass(frozen=True)
class Projection:
    child: "NraNode"
    items: Tuple[Tuple[Expr, str], ...]


@dataclass(frozen=True)
class Distinct:
    child: "NraNode"


@dataclass(frozen=True)
class AllDifferent:
    """Edge-isomorphism guard over scalar edge vars and path edge-lists."""

    child: "NraNode"
    edge_vars: Tuple[str, ...]
    path_vars: Tuple[str, ...]


@dataclass(frozen=True)
class UnwindPath:
    """UNWIND nodes(path) — one row per path vertex, order *not* preserved.

    Per the paper's fragment, unnesting an atomic path degrades it to a bag:
    the output binds ``out_var`` to each vertex id on the path, and
    downstream operators must not rely on order (ORD tradeoff, §4).
    """

    child: "NraNode"
    path_var: str
    out_var: str


NraNode = Union[
    GetVertices,
    GetEdges,
    NaturalJoin,
    AntiJoin,
    TransitiveJoin,
    Unnest,
    Selection,
    Projection,
    Distinct,
    AllDifferent,
    UnwindPath,
]

#: Attributes that are scalar variables (join keys): vertex/edge vars only.
#: Path vars, property attrs and props-maps are never join keys.


def schema(node: NraNode) -> List[str]:
    """Logical output attributes (a path var is one logical attribute)."""
    if isinstance(node, (GetVertices, GetEdges)):
        return node.output()
    if isinstance(node, NaturalJoin):
        ls, rs = schema(node.left), schema(node.right)
        return ls + [a for a in rs if a not in ls]
    if isinstance(node, AntiJoin):
        return schema(node.left)
    if isinstance(node, TransitiveJoin):
        out = list(schema(node.left))
        if node.src_attr not in out:
            raise ValueError(f"transitive join source {node.src_attr!r} not in {out}")
        for v in (node.dst_var, node.path_var):
            if v in out:
                raise ValueError(f"variable {v!r} already bound")
            out.append(v)
        return out
    if isinstance(node, Unnest):
        return schema(node.child) + [attr for _, _, attr in node.items]
    if isinstance(node, (Selection, AllDifferent, Distinct)):
        return schema(node.child)
    if isinstance(node, Projection):
        return [alias for _, alias in node.items]
    if isinstance(node, UnwindPath):
        return schema(node.child) + [node.out_var]
    raise TypeError(f"not an NRA node: {node!r}")


def children(node: NraNode) -> Sequence[NraNode]:
    if isinstance(node, (GetVertices, GetEdges)):
        return ()
    if isinstance(node, (NaturalJoin, AntiJoin)):
        return (node.left, node.right)
    if isinstance(node, TransitiveJoin):
        return (node.left,)
    return (node.child,)


def replace_children(node: NraNode, new: Sequence[NraNode]) -> NraNode:
    """Structural copy of ``node`` with its children replaced."""
    import dataclasses

    if isinstance(node, (GetVertices, GetEdges)):
        assert not new
        return node
    if isinstance(node, (NaturalJoin, AntiJoin)):
        return dataclasses.replace(node, left=new[0], right=new[1])
    if isinstance(node, TransitiveJoin):
        return dataclasses.replace(node, left=new[0])
    return dataclasses.replace(node, child=new[0])


def walk(node: NraNode):
    """Pre-order traversal."""
    yield node
    for c in children(node):
        yield from walk(c)
