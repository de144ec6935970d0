"""Shared test helpers: DuckDB graph oracle + bag comparison utilities."""
from __future__ import annotations

from typing import Iterable, Optional

import duckdb
import pandas as pd

from repro.graph.property_graph import PropertyGraph


def oracle_query(graph: PropertyGraph, sql: str, *prop_keys: str) -> pd.DataFrame:
    """Run ``sql`` in DuckDB over the flattened graph tables.

    Tables exposed: ``vertices(id, label, p_<key>…)`` and
    ``edges(id, src, dst, type)``.
    """
    v, e = graph.flat_pandas(*prop_keys)
    con = duckdb.connect()
    try:
        con.register("vertices", v)
        con.register("edges", e)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def path_col_to_str(pdf: pd.DataFrame, col: str, out: Optional[str] = None) -> pd.DataFrame:
    """Convert a tuple-of-ids path column to an '->'-joined string column."""
    out = out or col
    pdf = pdf.copy()
    pdf[out] = ["->".join(str(int(x)) for x in t) for t in pdf[col]]
    if out != col:
        pdf = pdf.drop(columns=[col])
    return pdf


def canon_bag(pdf: pd.DataFrame) -> pd.DataFrame:
    """Canonical representation of a bag: sorted rows, sorted columns."""
    pdf = pdf[sorted(pdf.columns)].copy()
    for c in pdf.columns:
        if pdf[c].dtype == object:
            pdf[c] = pdf[c].map(lambda v: v if v is None else v)
    return pdf.sort_values(list(pdf.columns), na_position="last").reset_index(drop=True)


def assert_bag_equal(got: pd.DataFrame, expected: pd.DataFrame, context: str = "") -> None:
    """Bag equality (duplicates matter, order does not)."""
    g, e = canon_bag(got), canon_bag(expected)
    assert list(g.columns) == list(e.columns), f"{context} columns: {list(g.columns)} vs {list(e.columns)}"
    assert len(g) == len(e), f"{context} row count: {len(g)} vs {len(e)}\n{g}\nvs\n{e}"
    pd.testing.assert_frame_equal(
        g.reset_index(drop=True).astype(object),
        e.reset_index(drop=True).astype(object),
        check_dtype=False,
        obj=context or "bag",
    )


def run_batch(spark, graph: PropertyGraph, cypher: str, *, pushdown: bool = True) -> pd.DataFrame:
    """Compile + batch-evaluate a query; canonical pandas (tuple paths)."""
    from repro.core.recompute import canonical_pandas
    from repro.core.session import compile_to_fra
    from repro.fra.eval_spark import EvalContext, evaluate, physical_fields

    plan = compile_to_fra(cypher, pushdown=pushdown)
    ctx = EvalContext.from_graph(spark, graph)
    return canonical_pandas(evaluate(plan, ctx), physical_fields(plan))


def check_incremental_vs_recompute(
    spark,
    graph_factory,
    cypher: str,
    txns,
    *,
    pushdown: bool = True,
) -> None:
    """Golden equivalence: after every transaction, the incrementally
    maintained view must equal a from-scratch recomputation.

    ``graph_factory`` is called twice so each engine owns an identical but
    independent graph instance.
    """
    from repro.core.session import prepare_view

    inc = prepare_view(spark, graph_factory(), cypher, mode="incremental", pushdown=pushdown)
    rec = prepare_view(spark, graph_factory(), cypher, mode="recompute", pushdown=pushdown)
    inc.initialize()
    rec.initialize()
    assert_bag_equal(inc.results(), rec.results(), "initial")
    for i, t in enumerate(txns):
        inc.apply(t)
        rec.apply(t)
        assert_bag_equal(inc.results(), rec.results(), f"after txn {i}: {t}")


#: Recursive-CTE skeleton for trail-semantics REPLY*-style closures.
#: Format with type=<edge type>; result columns: root, cur, vstr.
TRAIL_CTE = """
WITH RECURSIVE paths(root, cur, es, vstr) AS (
    SELECT e.src, e.dst, [e.id],
           CAST(e.src AS VARCHAR) || '->' || CAST(e.dst AS VARCHAR)
    FROM edges e WHERE e.type = '{type}'
    UNION ALL
    SELECT p.root, e.dst, list_append(p.es, e.id),
           p.vstr || '->' || CAST(e.dst AS VARCHAR)
    FROM paths p JOIN edges e
      ON e.src = p.cur AND e.type = '{type}' AND NOT list_contains(p.es, e.id)
)
"""
