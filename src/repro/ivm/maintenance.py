"""Transaction input preparation for the dataflow network.

Converts a :class:`~repro.graph.transactions.GraphDelta` (net α/β row
changes) into the per-transaction :class:`TxnInput` the dataflow nodes
consume: signed-multiplicity α/β delta relations, lifted to Spark once and
shared by every scan node, plus access to the post-transaction graph for
operators that need current base relations (anti-join partial recompute,
transitive-closure extension).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, Optional

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import LongType, StructField, StructType

from repro.graph.property_graph import PropertyGraph
from repro.graph.schema import EDGE_SCHEMA, VERTEX_SCHEMA
from repro.graph.transactions import GraphDelta
from repro.ivm.state import MULT


def _with_mult(schema: StructType) -> StructType:
    return StructType(list(schema.fields) + [StructField(MULT, LongType(), False)])


ALPHA_DELTA_SCHEMA = _with_mult(VERTEX_SCHEMA)
BETA_DELTA_SCHEMA = _with_mult(EDGE_SCHEMA)


@dataclass
class TxnInput:
    """Everything one transaction's propagation needs, computed lazily."""

    spark: SparkSession
    graph: PropertyGraph  # post-transaction state
    delta: GraphDelta
    _alpha_delta: Optional[DataFrame] = None
    _beta_delta: Optional[DataFrame] = None
    _beta_now: Optional[DataFrame] = None

    def alpha_delta(self) -> DataFrame:
        """Signed vertex delta (canonical α columns + __mult)."""
        if self._alpha_delta is None:
            rows = [
                (r["id"], r["label"], dict(r["properties"]), +1)
                for r in self.delta.v_inserts
            ] + [
                (r["id"], r["label"], dict(r["properties"]), -1)
                for r in self.delta.v_deletes
            ]
            self._alpha_delta = self.spark.createDataFrame(rows, ALPHA_DELTA_SCHEMA)
        return self._alpha_delta

    def beta_delta(self) -> DataFrame:
        """Signed edge delta (canonical β columns + __mult)."""
        if self._beta_delta is None:
            rows = [
                (r["id"], r["src"], r["dst"], r["type"], dict(r["properties"]), +1)
                for r in self.delta.e_inserts
            ] + [
                (r["id"], r["src"], r["dst"], r["type"], dict(r["properties"]), -1)
                for r in self.delta.e_deletes
            ]
            self._beta_delta = self.spark.createDataFrame(rows, BETA_DELTA_SCHEMA)
        return self._beta_delta

    def beta_now(self) -> DataFrame:
        """The full post-transaction β (for transitive-closure extension)."""
        if self._beta_now is None:
            self._beta_now = self.graph.edges_df(self.spark)
        return self._beta_now

    def structural_edge_delta(self) -> pd.DataFrame:
        """Net edge delta on (id, src, dst, type) only, as driver rows.

        Property-only edge updates appear in the β delta as delete+insert of
        the same structural row; netting them out here keeps the transitive
        closure from rebuilding paths whose topology did not change (edge
        FGN for paths).
        """
        rows: Dict[tuple, int] = {}
        for r in self.delta.e_inserts:
            k = (r["id"], r["src"], r["dst"], r["type"])
            rows[k] = rows.get(k, 0) + 1
        for r in self.delta.e_deletes:
            k = (r["id"], r["src"], r["dst"], r["type"])
            rows[k] = rows.get(k, 0) - 1
        out = [
            {"id": k[0], "src": k[1], "dst": k[2], "type": k[3], MULT: m}
            for k, m in rows.items()
            if m != 0
        ]
        return pd.DataFrame(out, columns=["id", "src", "dst", "type", MULT])
