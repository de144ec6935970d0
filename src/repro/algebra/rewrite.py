"""GRA → NRA rewrite — compilation step 2 (paper §4).

The key step that makes the query maintainable: expand-out operators cannot
be maintained incrementally (their input is a *relation*, so an edge
insertion gives no delta), so each

* ``↑_(v)^(w:W)[:E](r)``  becomes  ``r ⋈ ⇑(v,e,w)[:E] ⋈ ○_(w:W)`` and each
* ``↑_(v)^(w:W)[:E*](r)`` becomes  ``r ⋈* ⇑ … ⋈ ○_(w:W)``

(label enforcement is split into an explicit ○ join so that label changes
flow through ordinary join deltas). Property reads inside selections and
projections become explicit attribute-naming ``Unnest`` operators
μ_{v.key→attr}, the paper's schema-free modification of NRA's μ.
"""
from __future__ import annotations

import itertools
from typing import Tuple

from repro.algebra import expr as ex
from repro.algebra import gra, nra


class _Fresh:
    """Generator of fresh internal variable names (never clash: '#' prefix)."""

    def __init__(self) -> None:
        self._c = itertools.count(1)

    def edge(self) -> str:
        return f"#e{next(self._c)}"

    def path(self) -> str:
        return f"#p{next(self._c)}"


def to_nra(node: gra.GraNode) -> nra.NraNode:
    """Rewrite a GRA tree to an NRA tree (no ExpandOut remains)."""
    return _rw(node, _Fresh())


def _rw(node: gra.GraNode, fresh: _Fresh) -> nra.NraNode:
    if isinstance(node, gra.GetVertices):
        return nra.GetVertices(var=node.var, label=node.label)

    if isinstance(node, gra.ExpandOut):
        child = _rw(node.child, fresh)
        if node.is_transitive:
            out: nra.NraNode = nra.TransitiveJoin(
                left=child,
                src_attr=node.src_var,
                dst_var=node.dst_var,
                path_var=node.path_var or fresh.path(),
                edge_type=node.edge_type,
                direction=node.direction,
                min_hops=node.min_hops,
                max_hops=node.max_hops,
            )
        else:
            edges = nra.GetEdges(
                src_var=node.src_var,
                edge_var=node.edge_var or fresh.edge(),
                dst_var=node.dst_var,
                edge_type=node.edge_type,
                direction=node.direction,
            )
            out = nra.NaturalJoin(left=child, right=edges)
        if node.dst_label is not None:
            out = nra.NaturalJoin(
                left=out, right=nra.GetVertices(var=node.dst_var, label=node.dst_label)
            )
        return out

    if isinstance(node, gra.Selection):
        child = _rw(node.child, fresh)
        child, mapping = _unnest_for(child, node.predicate)
        return nra.Selection(child=child, predicate=ex.substitute_props(node.predicate, mapping))

    if isinstance(node, gra.Projection):
        child = _rw(node.child, fresh)
        mapping: dict = {}
        for e, _alias in node.items:
            child, m = _unnest_for(child, e)
            mapping.update(m)
        items = tuple(
            (ex.substitute_props(e, mapping), alias) for e, alias in node.items
        )
        return nra.Projection(child=child, items=items)

    if isinstance(node, gra.AllDifferent):
        return nra.AllDifferent(
            child=_rw(node.child, fresh),
            edge_vars=node.edge_vars,
            path_vars=node.path_vars,
        )

    if isinstance(node, gra.NaturalJoin):
        return nra.NaturalJoin(left=_rw(node.left, fresh), right=_rw(node.right, fresh))

    if isinstance(node, gra.AntiJoin):
        return nra.AntiJoin(left=_rw(node.left, fresh), right=_rw(node.right, fresh))

    if isinstance(node, gra.Distinct):
        return nra.Distinct(child=_rw(node.child, fresh))

    if isinstance(node, gra.UnwindPath):
        return nra.UnwindPath(
            child=_rw(node.child, fresh), path_var=node.path_var, out_var=node.out_var
        )

    raise TypeError(f"not a GRA node: {node!r}")


def _unnest_for(child: nra.NraNode, e: ex.Expr) -> Tuple[nra.NraNode, dict]:
    """Wrap ``child`` in an Unnest providing every property ``e`` reads.

    Returns the (possibly unchanged) child and the {(var, key) → attr}
    substitution map. Properties already in the child's schema (unnested by
    an operator below) are reused, not re-unnested.
    """
    accesses = ex.prop_accesses(e)
    if not accesses:
        return child, {}
    have = set(nra.schema(child))
    mapping = {(a.var, a.key): nra.prop_attr(a.var, a.key) for a in accesses}
    items = tuple(
        (a.var, a.key, nra.prop_attr(a.var, a.key))
        for a in accesses
        if nra.prop_attr(a.var, a.key) not in have
    )
    if not items:
        return child, mapping
    return nra.Unnest(child=child, items=items), mapping
