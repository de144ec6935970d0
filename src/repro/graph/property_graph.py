"""Mutable property graph holding the nested relations α and β.

The graph is the system's source of truth across a transaction stream. Rows
live in driver-side dicts (O(1) point updates — the graph receives
fine-grained updates, which Spark's immutable DataFrames cannot absorb in
place); :meth:`PropertyGraph.vertices_df` / :meth:`edges_df` lift the
current state to Spark DataFrames with the canonical α/β schemas for all
relational processing, and :meth:`flat_pandas` exports the flattened tables
the DuckDB oracle queries.

:meth:`apply` executes a :class:`~repro.graph.transactions.Transaction`
atomically and returns the *net* :class:`~repro.graph.transactions.GraphDelta`
(before/after diff of every touched row) that drives incremental view
maintenance.
"""
from __future__ import annotations

import itertools
from typing import Dict, Iterable, Optional

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.graph import transactions as tx
from repro.graph.schema import EDGE_SCHEMA, VERTEX_SCHEMA


class GraphConstraintError(ValueError):
    """Raised when a transaction violates graph integrity (dup id, dangling edge)."""


class PropertyGraph:
    """A property graph G = (V, E, st, L, T, Pv, Pe) with transactional updates."""

    def __init__(self) -> None:
        self._vertices: Dict[int, dict] = {}
        self._edges: Dict[int, dict] = {}
        self._out: Dict[int, set] = {}  # vertex id -> incident edge ids (src side)
        self._in: Dict[int, set] = {}  # vertex id -> incident edge ids (dst side)
        self._id_counter = itertools.count(1)

    # ------------------------------------------------------------------ ids
    def fresh_id(self) -> int:
        """Return an id unused by any current vertex or edge."""
        while True:
            i = next(self._id_counter)
            if i not in self._vertices and i not in self._edges:
                return i

    # ------------------------------------------------------------ accessors
    @property
    def num_vertices(self) -> int:
        return len(self._vertices)

    @property
    def num_edges(self) -> int:
        return len(self._edges)

    def vertex(self, vid: int) -> dict:
        return dict(self._vertices[vid], properties=dict(self._vertices[vid]["properties"]))

    def edge(self, eid: int) -> dict:
        return dict(self._edges[eid], properties=dict(self._edges[eid]["properties"]))

    def has_vertex(self, vid: int) -> bool:
        return vid in self._vertices

    def has_edge(self, eid: int) -> bool:
        return eid in self._edges

    # ----------------------------------------------------------- bulk load
    @classmethod
    def from_rows(
        cls, vertices: Iterable[dict], edges: Iterable[dict]
    ) -> "PropertyGraph":
        """Build a graph from row dicts (no delta tracking; validates refs)."""
        g = cls()
        for v in vertices:
            g._put_vertex(
                {"id": int(v["id"]), "label": v["label"], "properties": dict(v.get("properties") or {})}
            )
        for e in edges:
            g._put_edge(
                {
                    "id": int(e["id"]),
                    "src": int(e["src"]),
                    "dst": int(e["dst"]),
                    "type": e["type"],
                    "properties": dict(e.get("properties") or {}),
                }
            )
        return g

    def _put_vertex(self, row: dict) -> None:
        if row["id"] in self._vertices or row["id"] in self._edges:
            raise GraphConstraintError(f"duplicate id {row['id']}")
        self._vertices[row["id"]] = row
        self._out.setdefault(row["id"], set())
        self._in.setdefault(row["id"], set())

    def _put_edge(self, row: dict) -> None:
        if row["id"] in self._edges or row["id"] in self._vertices:
            raise GraphConstraintError(f"duplicate id {row['id']}")
        if row["src"] not in self._vertices or row["dst"] not in self._vertices:
            raise GraphConstraintError(
                f"edge {row['id']} references missing vertex "
                f"({row['src']} -> {row['dst']})"
            )
        self._edges[row["id"]] = row
        self._out[row["src"]].add(row["id"])
        self._in[row["dst"]].add(row["id"])

    # --------------------------------------------------------- transactions
    def apply(self, transaction: tx.Transaction) -> tx.GraphDelta:
        """Apply a transaction atomically; return the net α/β delta.

        Operations run in order; any constraint violation raises
        :class:`GraphConstraintError` and leaves the graph unmodified.
        ``DeleteVertex`` cascades to incident edges. The returned delta is
        *net*: a row whose final content equals its initial content does not
        appear at all; a changed row appears as delete(before) + insert(after).
        """
        before_v = {}  # touched vertex id -> snapshot-or-None before txn
        before_e = {}
        undo_v = dict(self._vertices)
        undo_e = dict(self._edges)
        undo_out = {k: set(v) for k, v in self._out.items()}
        undo_in = {k: set(v) for k, v in self._in.items()}

        def snap_v(vid: int) -> None:
            if vid not in before_v:
                r = undo_v.get(vid)
                before_v[vid] = _copy_row(r) if r is not None else None

        def snap_e(eid: int) -> None:
            if eid not in before_e:
                r = undo_e.get(eid)
                before_e[eid] = _copy_row(r) if r is not None else None

        try:
            for op in transaction:
                if isinstance(op, tx.AddVertex):
                    snap_v(op.id)
                    self._put_vertex(
                        {"id": op.id, "label": op.label, "properties": dict(op.properties)}
                    )
                elif isinstance(op, tx.DeleteVertex):
                    if op.id not in self._vertices:
                        raise GraphConstraintError(f"no vertex {op.id}")
                    snap_v(op.id)
                    for eid in sorted(self._out[op.id] | self._in[op.id]):
                        snap_e(eid)
                        self._drop_edge(eid)
                    del self._vertices[op.id]
                    del self._out[op.id]
                    del self._in[op.id]
                elif isinstance(op, tx.AddEdge):
                    snap_e(op.id)
                    self._put_edge(
                        {
                            "id": op.id,
                            "src": op.src,
                            "dst": op.dst,
                            "type": op.type,
                            "properties": dict(op.properties),
                        }
                    )
                elif isinstance(op, tx.DeleteEdge):
                    if op.id not in self._edges:
                        raise GraphConstraintError(f"no edge {op.id}")
                    snap_e(op.id)
                    self._drop_edge(op.id)
                elif isinstance(op, (tx.SetProperty, tx.RemoveProperty)):
                    store = self._vertices if op.kind == "vertex" else self._edges
                    if op.id not in store:
                        raise GraphConstraintError(f"no {op.kind} {op.id}")
                    (snap_v if op.kind == "vertex" else snap_e)(op.id)
                    row = store[op.id]
                    if isinstance(op, tx.SetProperty):
                        row["properties"][op.key] = op.value
                    else:
                        row["properties"].pop(op.key, None)
                else:  # pragma: no cover - defensive
                    raise TypeError(f"unknown operation {op!r}")
        except Exception:
            self._vertices, self._edges = undo_v, undo_e
            self._out, self._in = undo_out, undo_in
            raise

        return self._net_delta(before_v, before_e)

    def _drop_edge(self, eid: int) -> None:
        row = self._edges.pop(eid)
        self._out[row["src"]].discard(eid)
        self._in[row["dst"]].discard(eid)

    def _net_delta(self, before_v: dict, before_e: dict) -> tx.GraphDelta:
        d = tx.GraphDelta()
        for vid, old in sorted(before_v.items()):
            new = self._vertices.get(vid)
            new = _copy_row(new) if new is not None else None
            if old == new:
                continue
            if old is not None:
                d.v_deletes.append(old)
            if new is not None:
                d.v_inserts.append(new)
        for eid, old in sorted(before_e.items()):
            new = self._edges.get(eid)
            new = _copy_row(new) if new is not None else None
            if old == new:
                continue
            if old is not None:
                d.e_deletes.append(old)
            if new is not None:
                d.e_inserts.append(new)
        return d

    # -------------------------------------------------------------- exports
    def vertices_pandas(self) -> pd.DataFrame:
        rows = [
            {"id": r["id"], "label": r["label"], "properties": dict(r["properties"])}
            for r in self._vertices.values()
        ]
        return pd.DataFrame(rows, columns=["id", "label", "properties"])

    def edges_pandas(self) -> pd.DataFrame:
        rows = [
            {
                "id": r["id"],
                "src": r["src"],
                "dst": r["dst"],
                "type": r["type"],
                "properties": dict(r["properties"]),
            }
            for r in self._edges.values()
        ]
        return pd.DataFrame(rows, columns=["id", "src", "dst", "type", "properties"])

    def vertices_df(self, spark: SparkSession) -> DataFrame:
        """Current α as a Spark DataFrame."""
        return spark.createDataFrame(
            [
                (r["id"], r["label"], dict(r["properties"]))
                for r in self._vertices.values()
            ],
            schema=VERTEX_SCHEMA,
        )

    def edges_df(self, spark: SparkSession) -> DataFrame:
        """Current β as a Spark DataFrame."""
        return spark.createDataFrame(
            [
                (r["id"], r["src"], r["dst"], r["type"], dict(r["properties"]))
                for r in self._edges.values()
            ],
            schema=EDGE_SCHEMA,
        )

    def flat_pandas(self, *property_keys: str) -> tuple:
        """Flattened (vertices, edges) pandas tables for the DuckDB oracle.

        Each requested property key becomes a scalar column ``p_<key>`` on
        the vertex table (oracle SQL cannot index into map columns portably).
        """
        v = self.vertices_pandas()
        for k in property_keys:
            v[f"p_{k}"] = [props.get(k) for props in v["properties"]]
        v = v.drop(columns=["properties"])
        e = self.edges_pandas().drop(columns=["properties"])
        return v, e


def _copy_row(row: dict) -> dict:
    out = dict(row)
    out["properties"] = dict(row["properties"])
    return out
