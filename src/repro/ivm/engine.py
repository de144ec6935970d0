"""The incremental view maintenance engine (the paper's end product).

``IncrementalEngine`` owns a compiled dataflow network over one property
graph. ``initialize()`` runs a full evaluation to materialize every node's
state; each ``apply(transaction)`` then:

1. applies the transaction to the graph, obtaining the net α/β delta;
2. propagates deltas through the network in topological order (each node
   folds its output delta into its state as it goes);
3. returns per-transaction statistics (delta magnitude, rows touched).

``results()`` reads the maintained view from the root's state without any
recomputation — the low-latency read the paper's use cases (fraud
detection, model validation) are after.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Optional

import pandas as pd

from repro.algebra import nra
from repro.fra.eval_spark import EvalContext
from repro.graph.property_graph import PropertyGraph
from repro.graph.transactions import Transaction
from repro.ivm import state as st
from repro.ivm.maintenance import TxnInput
from repro.ivm.network import Network, build


@dataclass
class TxnStats:
    """Per-transaction maintenance statistics."""

    graph_delta_rows: int
    view_delta_rows: int
    rows_touched: int
    node_delta_rows: Dict[str, int] = field(default_factory=dict)


class IncrementalEngine:
    """Maintains one FRA plan incrementally over a mutable property graph."""

    def __init__(self, spark, graph: PropertyGraph, plan: nra.NraNode):
        self.spark = spark
        self.graph = graph
        self.plan = plan
        self.network: Network = build(plan)
        self._initialized = False

    # ------------------------------------------------------------------
    def initialize(self) -> None:
        """Full evaluation; materializes every node's state."""
        ctx = EvalContext.from_graph(self.spark, self.graph)
        outputs: Dict[int, object] = {}
        for node in self.network.order:
            child_dfs = [outputs[id(c)] for c in node.children]
            outputs[id(node)] = node.initialize(child_dfs, ctx)
        self._initialized = True

    # ------------------------------------------------------------------
    def apply(self, txn: Transaction) -> TxnStats:
        """Apply a graph transaction and maintain the view."""
        assert self._initialized, "call initialize() first"
        gd = self.graph.apply(txn)
        tin = TxnInput(spark=self.spark, graph=self.graph, delta=gd)
        deltas: Dict[int, pd.DataFrame] = {}
        rows_touched = 0
        node_rows: Dict[str, int] = {}
        for i, node in enumerate(self.network.order):
            child_deltas = [deltas[id(c)] for c in node.children]
            d = node.apply_delta(child_deltas, tin)
            deltas[id(node)] = d
            n = len(d) + node.extra_rows
            rows_touched += n
            node_rows[f"{i}:{type(node).__name__}"] = n
        root_delta = deltas[id(self.network.root)]
        return TxnStats(
            graph_delta_rows=gd.size(),
            view_delta_rows=len(root_delta),
            rows_touched=rows_touched,
            node_delta_rows=node_rows,
        )

    # ------------------------------------------------------------------
    def results(self) -> pd.DataFrame:
        """Current view contents (bag, multiplicities expanded)."""
        root = self.network.root
        return st.expand_bag(root.state, root.fields)

    def state_cells(self) -> int:
        """Total materialized cells across all node states (table T3 metric)."""
        total = 0
        for node in self.network.order:
            total += int(node.state.shape[0] * node.state.shape[1])
            if hasattr(node, "tc"):
                total += int(node.tc.shape[0] * node.tc.shape[1])
        return total
