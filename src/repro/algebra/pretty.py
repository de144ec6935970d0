"""Human-readable rendering of algebra trees and expressions.

Used by tests (structural golden strings) and by ``jobs/`` output so the
compilation pipeline's three stages can be eyeballed against the paper's
§4 example expressions.
"""
from __future__ import annotations

from repro.algebra import expr as ex
from repro.algebra import gra, nra


def expr_str(e: ex.Expr) -> str:
    if isinstance(e, ex.Attr):
        return e.name
    if isinstance(e, ex.PropAccess):
        return f"{e.var}.{e.key}"
    if isinstance(e, ex.Lit):
        return repr(e.value)
    if isinstance(e, ex.Cmp):
        return f"({expr_str(e.left)} {e.op} {expr_str(e.right)})"
    if isinstance(e, ex.And):
        return f"({expr_str(e.left)} AND {expr_str(e.right)})"
    if isinstance(e, ex.Or):
        return f"({expr_str(e.left)} OR {expr_str(e.right)})"
    if isinstance(e, ex.Not):
        return f"(NOT {expr_str(e.operand)})"
    raise TypeError(f"not an expression: {e!r}")


def _hops(min_hops, max_hops) -> str:
    hi = "" if max_hops == float("inf") else str(int(max_hops))
    return f"*{min_hops}..{hi}"


def _props(props, include_all: bool) -> str:
    parts = [f"{k}->{v}" for k, v in props.items()] if props else []
    if include_all:
        parts.append("*")
    return "{" + ",".join(parts) + "}" if parts else ""


def gra_str(node: gra.GraNode, indent: int = 0) -> str:
    """Indented multi-line rendering of a GRA tree."""
    pad = "  " * indent
    if isinstance(node, gra.GetVertices):
        return f"{pad}GetVertices({node.var}:{node.label or ''})"
    if isinstance(node, gra.ExpandOut):
        hops = "" if not node.is_transitive else _hops(node.min_hops, node.max_hops)
        arrow = "->" if node.direction == "out" else "<-"
        head = (
            f"{pad}Expand({node.src_var}){arrow}[{node.edge_var or ''}:"
            f"{node.edge_type or ''}{hops}]({node.dst_var}:{node.dst_label or ''})"
        )
        if node.path_var:
            head += f" path={node.path_var}"
        return head + "\n" + gra_str(node.child, indent + 1)
    if isinstance(node, gra.Selection):
        return f"{pad}Select[{expr_str(node.predicate)}]\n" + gra_str(node.child, indent + 1)
    if isinstance(node, gra.Projection):
        items = ", ".join(f"{expr_str(e)} AS {a}" for e, a in node.items)
        return f"{pad}Project[{items}]\n" + gra_str(node.child, indent + 1)
    if isinstance(node, gra.AllDifferent):
        return (
            f"{pad}AllDifferent[edges={list(node.edge_vars)}, paths={list(node.path_vars)}]\n"
            + gra_str(node.child, indent + 1)
        )
    if isinstance(node, gra.NaturalJoin):
        return (
            f"{pad}Join\n" + gra_str(node.left, indent + 1) + "\n" + gra_str(node.right, indent + 1)
        )
    if isinstance(node, gra.AntiJoin):
        return (
            f"{pad}AntiJoin\n" + gra_str(node.left, indent + 1) + "\n" + gra_str(node.right, indent + 1)
        )
    if isinstance(node, gra.Distinct):
        return f"{pad}Distinct\n" + gra_str(node.child, indent + 1)
    if isinstance(node, gra.UnwindPath):
        return f"{pad}UnwindPath[nodes({node.path_var}) AS {node.out_var}]\n" + gra_str(
            node.child, indent + 1
        )
    raise TypeError(f"not a GRA node: {node!r}")


def nra_str(node: nra.NraNode, indent: int = 0) -> str:
    """Indented multi-line rendering of an NRA/FRA tree."""
    pad = "  " * indent
    if isinstance(node, nra.GetVertices):
        return (
            f"{pad}GetVertices({node.var}:{node.label or ''})"
            f"{_props(node.props, node.include_properties)}"
        )
    if isinstance(node, nra.GetEdges):
        arrow = "->" if node.direction == "out" else "<-"
        return (
            f"{pad}GetEdges({node.src_var}){arrow}[{node.edge_var}:{node.edge_type or ''}]"
            f"({node.dst_var}){_props(node.props, node.include_properties)}"
        )
    if isinstance(node, nra.NaturalJoin):
        return f"{pad}Join\n" + nra_str(node.left, indent + 1) + "\n" + nra_str(node.right, indent + 1)
    if isinstance(node, nra.AntiJoin):
        return f"{pad}AntiJoin\n" + nra_str(node.left, indent + 1) + "\n" + nra_str(node.right, indent + 1)
    if isinstance(node, nra.TransitiveJoin):
        arrow = "->" if node.direction == "out" else "<-"
        return (
            f"{pad}TransitiveJoin({node.src_attr}){arrow}[:{node.edge_type or ''}"
            f"{_hops(node.min_hops, node.max_hops)}]({node.dst_var}) path={node.path_var}\n"
            + nra_str(node.left, indent + 1)
        )
    if isinstance(node, nra.Unnest):
        items = ", ".join(f"{v}.{k}->{a}" for v, k, a in node.items)
        return f"{pad}Unnest[{items}]\n" + nra_str(node.child, indent + 1)
    if isinstance(node, nra.Selection):
        return f"{pad}Select[{expr_str(node.predicate)}]\n" + nra_str(node.child, indent + 1)
    if isinstance(node, nra.Projection):
        items = ", ".join(f"{expr_str(e)} AS {a}" for e, a in node.items)
        return f"{pad}Project[{items}]\n" + nra_str(node.child, indent + 1)
    if isinstance(node, nra.Distinct):
        return f"{pad}Distinct\n" + nra_str(node.child, indent + 1)
    if isinstance(node, nra.AllDifferent):
        return (
            f"{pad}AllDifferent[edges={list(node.edge_vars)}, paths={list(node.path_vars)}]\n"
            + nra_str(node.child, indent + 1)
        )
    if isinstance(node, nra.UnwindPath):
        return f"{pad}UnwindPath[nodes({node.path_var}) AS {node.out_var}]\n" + nra_str(
            node.child, indent + 1
        )
    raise TypeError(f"not an NRA node: {node!r}")
