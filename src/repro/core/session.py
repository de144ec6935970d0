"""One-stop façade: Cypher text → maintained view.

Runs the paper's full compilation pipeline (§4):

1. openCypher → GRA        (``repro.cypher``)
2. GRA → NRA               (``repro.algebra.rewrite``)
3. NRA → FRA               (``repro.algebra.schema_inference``; minimal
   schema via property pushdown, or the whole-map baseline for T3)
4. FRA → engine            (incremental dataflow, or the full-recompute
   baseline behind the same interface)

Typical use::

    view = prepare_view(spark, graph, "MATCH (p:Post) ... RETURN p", mode="incremental")
    view.initialize()
    stats = view.apply(transaction)
    rows = view.results()
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Literal, Union

from repro.algebra import nra, rewrite, schema_inference
from repro.core.recompute import RecomputeEngine
from repro.cypher.compile import compile_cypher
from repro.graph.property_graph import PropertyGraph
from repro.ivm.engine import IncrementalEngine

Engine = Union[IncrementalEngine, RecomputeEngine]


def compile_to_fra(cypher: str, *, pushdown: bool = True) -> nra.NraNode:
    """Steps 1–3: Cypher text to an executable FRA plan."""
    plan = schema_inference.prepare(rewrite.to_nra(compile_cypher(cypher)), pushdown=pushdown)
    if pushdown:
        schema_inference.assert_flat(plan)
    return plan


def prepare_view(
    spark,
    graph: PropertyGraph,
    cypher: str,
    *,
    mode: Literal["incremental", "recompute"] = "incremental",
    pushdown: bool = True,
) -> Engine:
    """Compile ``cypher`` and attach an (uninitialized) engine to ``graph``."""
    plan = compile_to_fra(cypher, pushdown=pushdown)
    if mode == "incremental":
        return IncrementalEngine(spark, graph, plan)
    if mode == "recompute":
        return RecomputeEngine(spark, graph, plan)
    raise ValueError(f"unknown mode {mode!r}")
