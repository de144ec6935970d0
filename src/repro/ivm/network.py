"""Build a dataflow network from an FRA plan.

One dataflow node per algebra operator; the returned network exposes the
nodes in topological (children-first) order, which is also the delta
propagation order — a node's children always have post-transaction states
by the time it computes its own delta (the primed-state join formula in
``repro.ivm.nodes`` relies on this).
"""
from __future__ import annotations

from typing import Dict, List, Type

from repro.algebra import nra
from repro.ivm import nodes as dn


_NODE_CLASSES: Dict[type, Type[dn.DataflowNode]] = {
    nra.GetVertices: dn.ScanVerticesNode,
    nra.GetEdges: dn.ScanEdgesNode,
    nra.NaturalJoin: dn.JoinNode,
    nra.AntiJoin: dn.AntiJoinNode,
    nra.TransitiveJoin: dn.TransitiveJoinNode,
    nra.Unnest: dn.UnnestNode,
    nra.Selection: dn.FilterNode,
    nra.Projection: dn.ProjectNode,
    nra.Distinct: dn.DistinctNode,
    nra.AllDifferent: dn.AllDifferentNode,
    nra.UnwindPath: dn.UnwindNode,
}


class Network:
    """The compiled dataflow: ``root`` plus topological node order."""

    def __init__(self, root: dn.DataflowNode, order: List[dn.DataflowNode]):
        self.root = root
        self.order = order

    def __len__(self) -> int:
        return len(self.order)


def build(plan: nra.NraNode) -> Network:
    order: List[dn.DataflowNode] = []

    def rec(node: nra.NraNode) -> dn.DataflowNode:
        children = [rec(c) for c in nra.children(node)]
        cls = _NODE_CLASSES.get(type(node))
        if cls is None:
            raise TypeError(f"no dataflow node for {type(node).__name__}")
        n = cls(node, children)
        order.append(n)
        return n

    root = rec(plan)
    return Network(root, order)
