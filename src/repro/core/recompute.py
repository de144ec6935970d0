"""Full-recomputation baseline engine.

Same interface as :class:`~repro.ivm.engine.IncrementalEngine`, but every
transaction triggers a from-scratch evaluation of the FRA plan over the
current graph — the strategy every non-incremental property graph system
in the paper's related work uses, and the baseline all tables compare
against.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

import pandas as pd
from pyspark.sql import functions as F

from repro.algebra import nra
from repro.fra.eval_spark import EvalContext, evaluate, physical_fields
from repro.graph.property_graph import PropertyGraph
from repro.graph.transactions import Transaction
from repro.ivm import state as st
from repro.ivm.engine import TxnStats


def canonical_pandas(df, fields) -> pd.DataFrame:
    """Collect a bag DataFrame into the canonical driver representation."""
    pdf = st.collect(df.withColumn(st.MULT, F.lit(1)), fields)
    return pdf.drop(columns=[st.MULT])


class RecomputeEngine:
    """Recomputes the whole view on every transaction."""

    def __init__(self, spark, graph: PropertyGraph, plan: nra.NraNode):
        self.spark = spark
        self.graph = graph
        self.plan = plan
        self.fields = physical_fields(plan)
        self.cols = [c for c, _t in self.fields]
        self._cached: Optional[pd.DataFrame] = None

    def initialize(self) -> None:
        self._recompute(instrument=False)

    def _recompute(self, *, instrument: bool) -> int:
        ctx = EvalContext.from_graph(self.spark, self.graph, instrument=instrument)
        df = evaluate(self.plan, ctx)
        self._cached = canonical_pandas(df, self.fields)
        return ctx.rows_touched

    def apply(self, txn: Transaction, *, instrument: bool = False) -> TxnStats:
        gd = self.graph.apply(txn)
        before = self._cached
        rows = self._recompute(instrument=instrument)
        # view delta size (for parity with the incremental stats): symmetric
        # difference of the materialized bags.
        delta_rows = _bag_diff_size(before, self._cached, self.fields)
        return TxnStats(
            graph_delta_rows=gd.size(),
            view_delta_rows=delta_rows,
            rows_touched=rows if instrument else len(self._cached),
        )

    def results(self) -> pd.DataFrame:
        assert self._cached is not None, "call initialize() first"
        return self._cached.copy()


def _bag_diff_size(before: Optional[pd.DataFrame], after: pd.DataFrame, fields) -> int:
    if before is None:
        return len(after)
    b = before.copy()
    a = after.copy()
    b[st.MULT] = -1
    a[st.MULT] = 1
    net = st.normalize(pd.concat([a, b], ignore_index=True), fields)
    return int(net[st.MULT].abs().sum())
