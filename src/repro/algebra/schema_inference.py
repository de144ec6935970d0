"""NRA → FRA: minimal-schema inference via property pushdown — step 3.

Property graphs are schema-free, so — unlike classical NRA→FRA flattening
[Van den Bussche'01, Paredaens/Van Gucht'92] — the schema of the nested
relations is *not known in advance* and must be inferred from the query.
This pass removes every :class:`~repro.algebra.nra.Unnest` by pushing its
``(var, key → attr)`` items down into the ○/⇑ leaf operator that binds
``var``, producing leaves annotated like ``○_(p:Post{lang→p__lang})``: each
operator then carries exactly the *minimal schema* the query needs
(paper §4 step 3 and "Summary of contributions").

Variables with no owning leaf (e.g. the destination of an unlabelled
transitive join, or an UNWIND output) get a fresh unlabelled ○ scan joined
in at the Unnest site — property reads always bottom out at a scan, which
is what makes them incrementally maintainable.

:func:`prepare(plan, pushdown=False)` builds the *non-inferred baseline*
for table T3: every leaf ships its entire nested ``properties`` map
(``include_properties=True``) and the Unnest operators stay in the tree,
reading from those maps at query time.
"""
from __future__ import annotations

import dataclasses
from typing import Dict, Tuple

from repro.algebra import nra


def infer(plan: nra.NraNode) -> nra.NraNode:
    """Push all property reads down to leaf scans; drop Unnest nodes."""
    return _transform(plan, pushdown=True)


def prepare(plan: nra.NraNode, *, pushdown: bool = True) -> nra.NraNode:
    """Produce the executable FRA plan, with or without minimal-schema inference."""
    if pushdown:
        return infer(plan)
    return _transform(plan, pushdown=False)


def _transform(node: nra.NraNode, *, pushdown: bool) -> nra.NraNode:
    kids = [_transform(c, pushdown=pushdown) for c in nra.children(node)]
    node = nra.replace_children(node, kids)

    if isinstance(node, (nra.GetVertices, nra.GetEdges)) and not pushdown:
        return dataclasses.replace(node, include_properties=True)

    if isinstance(node, nra.Unnest):
        child = node.child
        if pushdown:
            residual: Dict[str, Dict[str, str]] = {}
            for var, key, attr in node.items:
                pushed, child = _try_push(child, var, key, attr)
                if not pushed:
                    residual.setdefault(var, {})[key] = attr
            for var, props in residual.items():
                child = nra.NaturalJoin(
                    left=child, right=nra.GetVertices(var=var, label=None, props=props)
                )
            return child
        # Baseline: keep Unnest, but make sure every referenced var has its
        # properties map in scope (join in a full scan when it does not).
        have = set(nra.schema(child))
        missing_vars = {
            var for var, _k, _a in node.items if nra.props_attr(var) not in have
        }
        for var in sorted(missing_vars):
            child = nra.NaturalJoin(
                left=child,
                right=nra.GetVertices(var=var, label=None, include_properties=True),
            )
        return dataclasses.replace(node, child=child)

    return node


def _try_push(
    node: nra.NraNode, var: str, key: str, attr: str
) -> Tuple[bool, nra.NraNode]:
    """Push one property read into the first leaf that binds ``var``.

    A :class:`GetVertices` leaf owns its vertex var; a :class:`GetEdges`
    leaf owns its *edge* var (src/dst vertex ids on ⇑ are bare ids — their
    properties live on a ○ scan). Returns (pushed?, new tree).
    """
    if isinstance(node, nra.GetVertices):
        if node.var == var:
            if node.props.get(key) not in (None, attr):  # pragma: no cover - defensive
                raise ValueError(f"conflicting pushdown for {var}.{key}")
            props = dict(node.props)
            props[key] = attr
            return True, dataclasses.replace(node, props=props)
        return False, node
    if isinstance(node, nra.GetEdges):
        if node.edge_var == var:
            props = dict(node.props)
            props[key] = attr
            return True, dataclasses.replace(node, props=props)
        return False, node

    kids = list(nra.children(node))
    for i, c in enumerate(kids):
        pushed, new_c = _try_push(c, var, key, attr)
        if pushed:
            kids[i] = new_c
            return True, nra.replace_children(node, kids)
    return False, node


def assert_flat(plan: nra.NraNode) -> None:
    """Raise if any Unnest survived inference (plan is not FRA)."""
    for n in nra.walk(plan):
        if isinstance(n, nra.Unnest):
            raise AssertionError(f"plan is not flat; Unnest remains: {n}")
