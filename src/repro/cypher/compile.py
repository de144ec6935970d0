"""AST → GRA compilation — step 1 of the paper's pipeline (via [20]).

Each MATCH part compiles to a left-deep chain: ``GetVertices`` for the
anchor node, then one ``ExpandOut`` per relationship. Comma-separated parts
are combined with natural joins on their shared variables. Cypher's
relationship-uniqueness (edge isomorphism) is enforced by one
``AllDifferent`` over all edge and path variables of the MATCH. WHERE
becomes a selection (scalar conjuncts) plus one anti-join per
``NOT EXISTS`` term; UNWIND and RETURN [DISTINCT] close the tree.

Variable conventions: anonymous nodes/edges/paths get fresh ``#v``/``#e``/
``#p`` names (``#`` cannot appear in user identifiers). A variable
re-mentioned *within one chain* (cyclic patterns) expands to a fresh
variable plus an equality selection; re-mention *across parts* is handled
by the natural join.
"""
from __future__ import annotations

import itertools
from typing import List, Optional, Set, Tuple

from repro.algebra import expr as ex
from repro.algebra import gra
from repro.cypher import ast


class CypherCompileError(ValueError):
    """Semantic error: unbound or inconsistently used variables."""


class _Ctx:
    """Per-scope variable bookkeeping.

    ``edge_vars``/``path_vars`` are scoped to one MATCH (or one NOT EXISTS
    subpattern — Cypher's relationship uniqueness does not cross that
    boundary), but the fresh-name ``counter`` must be shared across scopes:
    a ``#e1`` in a NOT EXISTS subpattern colliding with the outer ``#e1``
    would silently become an anti-join key.
    """

    def __init__(self, counter=None) -> None:
        self._c = counter if counter is not None else itertools.count(1)
        self.edge_vars: List[str] = []
        self.path_vars: List[str] = []

    def subscope(self) -> "_Ctx":
        return _Ctx(self._c)

    def fresh(self, prefix: str) -> str:
        return f"#{prefix}{next(self._c)}"


def _check_name(name: Optional[str]) -> None:
    """Physical columns encode structure with ``__``; user names must not."""
    if name is not None and "__" in name:
        raise CypherCompileError(
            f"identifier {name!r} contains '__', which is reserved for "
            "internal column naming"
        )


def _validate_names(q: ast.Query) -> None:
    def check_part(part: ast.PathPattern) -> None:
        _check_name(part.path_var)
        for n in part.nodes:
            _check_name(n.var)
        for r in part.rels:
            _check_name(r.var)

    for part in q.patterns:
        check_part(part)
    if q.where:
        for ne in q.where.not_exists:
            for part in ne.patterns:
                check_part(part)
    if q.unwind:
        _check_name(q.unwind.path_var)
        _check_name(q.unwind.out_var)
    for it in q.items:
        _check_name(it.alias)
        if isinstance(it.expr, ex.PropAccess):
            _check_name(it.expr.key)


def to_gra(q: ast.Query) -> gra.GraNode:
    """Compile a parsed query to a GRA tree."""
    _validate_names(q)
    ctx = _Ctx()
    tree, bound = _compile_parts(q.patterns, ctx, alldiff=True)

    if q.where is not None:
        if q.where.predicates:
            pred = q.where.predicates[0]
            for p in q.where.predicates[1:]:
                pred = ex.And(pred, p)
            _check_pred_vars(pred, bound)
            tree = gra.Selection(child=tree, predicate=pred)
        for ne in q.where.not_exists:
            sub_ctx = ctx.subscope()
            sub, sub_bound = _compile_parts(ne.patterns, sub_ctx, alldiff=True)
            if not (bound & sub_bound):
                raise CypherCompileError(
                    "NOT EXISTS pattern shares no variable with the outer MATCH; "
                    "uncorrelated negation is not supported"
                )
            tree = gra.AntiJoin(left=tree, right=sub)

    if q.unwind is not None:
        if q.unwind.path_var not in bound:
            raise CypherCompileError(f"UNWIND of unbound path variable {q.unwind.path_var!r}")
        if q.unwind.out_var in bound:
            raise CypherCompileError(f"UNWIND output {q.unwind.out_var!r} already bound")
        tree = gra.UnwindPath(child=tree, path_var=q.unwind.path_var, out_var=q.unwind.out_var)
        bound = bound | {q.unwind.out_var}

    items = []
    seen_aliases: Set[str] = set()
    for it in q.items:
        for v in _expr_vars(it.expr):
            if v not in bound:
                raise CypherCompileError(f"RETURN references unbound variable {v!r}")
        if it.alias in seen_aliases:
            raise CypherCompileError(f"duplicate return alias {it.alias!r}")
        seen_aliases.add(it.alias)
        items.append((it.expr, it.alias))
    tree = gra.Projection(child=tree, items=tuple(items))
    if q.distinct:
        tree = gra.Distinct(child=tree)
    return tree


def _compile_parts(
    parts: Tuple[ast.PathPattern, ...], ctx: _Ctx, *, alldiff: bool
) -> Tuple[gra.GraNode, Set[str]]:
    trees = []
    bound: Set[str] = set()
    for part in parts:
        t, bound = _compile_part(part, ctx, bound)
        trees.append(t)
    tree = trees[0]
    for t in trees[1:]:
        tree = gra.NaturalJoin(left=tree, right=t)
    if alldiff and len(ctx.edge_vars) + len(ctx.path_vars) >= 2:
        tree = gra.AllDifferent(
            child=tree, edge_vars=tuple(ctx.edge_vars), path_vars=tuple(ctx.path_vars)
        )
    return tree, bound


def _compile_part(
    part: ast.PathPattern, ctx: _Ctx, outer_bound: Set[str]
) -> Tuple[gra.GraNode, Set[str]]:
    if part.path_var is not None:
        if len(part.rels) != 1 or not _is_transitive(part.rels[0]):
            raise ast.UnsupportedCypherError(
                "named paths are only supported for a single variable-length "
                "relationship (paths are atomic units in the fragment, paper §4)"
            )
        if part.path_var in outer_bound:
            raise CypherCompileError(f"path variable {part.path_var!r} already bound")

    chain_bound: Set[str] = set()
    eq_filters: List[ex.Expr] = []

    def node_var(np: ast.NodePattern) -> Tuple[str, Optional[str]]:
        """Resolve a node pattern to a variable usable as expand target."""
        v = np.var or ctx.fresh("v")
        if v in chain_bound:
            fresh = ctx.fresh("v")
            eq_filters.append(ex.Cmp("=", ex.Attr(fresh), ex.Attr(v)))
            return fresh, np.label
        return v, np.label

    anchor = part.nodes[0]
    a_var = anchor.var or ctx.fresh("v")
    tree: gra.GraNode = gra.GetVertices(var=a_var, label=anchor.label)
    chain_bound.add(a_var)

    last_var = a_var
    for rel, node in zip(part.rels, part.nodes[1:]):
        dst_var, dst_label = node_var(node)
        if _is_transitive(rel):
            p_var = part.path_var or ctx.fresh("p")
            ctx.path_vars.append(p_var)
            tree = gra.ExpandOut(
                child=tree,
                src_var=last_var,
                dst_var=dst_var,
                dst_label=dst_label,
                edge_type=rel.edge_type,
                direction=rel.direction,
                min_hops=rel.min_hops,
                max_hops=rel.max_hops,
                path_var=p_var,
            )
        else:
            e_var = rel.var or ctx.fresh("e")
            if e_var in chain_bound or e_var in outer_bound:
                raise CypherCompileError(f"edge variable {e_var!r} already bound")
            ctx.edge_vars.append(e_var)
            tree = gra.ExpandOut(
                child=tree,
                src_var=last_var,
                dst_var=dst_var,
                dst_label=dst_label,
                edge_type=rel.edge_type,
                direction=rel.direction,
                edge_var=e_var,
            )
            chain_bound.add(e_var)
        chain_bound.add(dst_var)
        last_var = dst_var

    for f in eq_filters:
        tree = gra.Selection(child=tree, predicate=f)

    bound = outer_bound | chain_bound
    if part.path_var is not None:
        bound = bound | {part.path_var}
    return tree, bound


def _is_transitive(rel: ast.RelPattern) -> bool:
    return not (rel.min_hops == 1 and rel.max_hops == 1)


def _expr_vars(e: ex.Expr) -> Set[str]:
    if isinstance(e, ex.Attr):
        return {e.name}
    if isinstance(e, ex.PropAccess):
        return {e.var}
    if isinstance(e, ex.Cmp):
        return _expr_vars(e.left) | _expr_vars(e.right)
    if isinstance(e, (ex.And, ex.Or)):
        return _expr_vars(e.left) | _expr_vars(e.right)
    if isinstance(e, ex.Not):
        return _expr_vars(e.operand)
    return set()


def _check_pred_vars(pred: ex.Expr, bound: Set[str]) -> None:
    missing = _expr_vars(pred) - bound
    if missing:
        raise CypherCompileError(f"WHERE references unbound variables {sorted(missing)}")


def compile_cypher(text: str) -> gra.GraNode:
    """Parse + compile in one call."""
    from repro.cypher.parser import parse

    return to_gra(parse(text))
