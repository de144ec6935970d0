"""Batch evaluation of FRA plans over Spark DataFrames.

This is the *full recomputation* evaluator: it turns an FRA tree (the NRA
node classes after schema inference — or with Unnest retained in the
no-pushdown baseline) into one Spark DataFrame over the current α/β
relations. The IVM engine (``repro.ivm``) maintains the same plans under
updates; their results must always coincide, which the test suite checks
against each other and against the DuckDB oracle.

Physical column mapping (logical attribute → DataFrame columns):

* vertex/edge variable ``v``  → ``v``       (long id)
* pushed-down property        → ``v__key``  (string)
* whole-properties map        → ``v__props`` (map, baseline mode only)
* path variable ``t``         → ``t__vs`` + ``t__es`` (array<long>)

Natural joins key on shared *scalar variable* attributes only; property,
props-map and path attributes are introduced by exactly one subtree each,
so they never collide.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Dict, List, Optional

from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.algebra import expr as ex
from repro.algebra import nra
from repro.fra.transitive import transitive_paths


@dataclass
class EvalContext:
    """Inputs + instrumentation for one evaluation.

    ``alpha``/``beta`` are the vertex/edge relations (canonical schemas).
    With ``instrument=True`` every operator's output cardinality is counted
    into ``rows_touched`` — the machine-independent work metric reported
    next to wall-clock in the tables (DESIGN.md §2).
    """

    spark: SparkSession
    alpha: DataFrame
    beta: DataFrame
    instrument: bool = False
    rows_touched: int = 0

    @classmethod
    def from_graph(cls, spark: SparkSession, graph, **kw) -> "EvalContext":
        return cls(spark=spark, alpha=graph.vertices_df(spark), beta=graph.edges_df(spark), **kw)


# --------------------------------------------------------------------- kinds

def attr_kinds(node: nra.NraNode) -> Dict[str, str]:
    """Logical attribute → kind ('var' | 'prop' | 'props' | 'path')."""
    if isinstance(node, nra.GetVertices):
        kinds = {node.var: "var"}
        for attr in node.props.values():
            kinds[attr] = "prop"
        if node.include_properties:
            kinds[nra.props_attr(node.var)] = "props"
        return kinds
    if isinstance(node, nra.GetEdges):
        kinds = {node.src_var: "var", node.edge_var: "var", node.dst_var: "var"}
        for attr in node.props.values():
            kinds[attr] = "prop"
        if node.include_properties:
            kinds[nra.props_attr(node.edge_var)] = "props"
        return kinds
    if isinstance(node, (nra.NaturalJoin,)):
        kinds = attr_kinds(node.left)
        kinds.update(attr_kinds(node.right))
        return kinds
    if isinstance(node, nra.AntiJoin):
        return attr_kinds(node.left)
    if isinstance(node, nra.TransitiveJoin):
        kinds = attr_kinds(node.left)
        kinds[node.dst_var] = "var"
        kinds[node.path_var] = "path"
        return kinds
    if isinstance(node, nra.Unnest):
        kinds = attr_kinds(node.child)
        for _v, _k, attr in node.items:
            kinds[attr] = "prop"
        return kinds
    if isinstance(node, (nra.Selection, nra.Distinct, nra.AllDifferent)):
        return attr_kinds(node.child)
    if isinstance(node, nra.Projection):
        child = attr_kinds(node.child)
        out = {}
        for e, alias in node.items:
            if isinstance(e, ex.Attr):
                out[alias] = child[e.name]
            else:
                out[alias] = "prop"
        return out
    if isinstance(node, nra.UnwindPath):
        kinds = attr_kinds(node.child)
        kinds[node.out_var] = "var"
        return kinds
    raise TypeError(f"not an NRA node: {node!r}")


def physical_columns(attr: str, kind: str) -> List[str]:
    return [f"{attr}__vs", f"{attr}__es"] if kind == "path" else [attr]


def physical_schema(node: nra.NraNode) -> List[str]:
    """Physical column list for a node, in logical-schema order."""
    return [c for c, _t in physical_fields(node)]


def physical_fields(node: nra.NraNode) -> List[tuple]:
    """Physical (column, type-tag) list; tags: 'long'|'string'|'array'|'map'.

    Driver-side state helpers need explicit types because projection
    aliases are user-chosen names that carry no structural convention.
    """
    kinds = attr_kinds(node)
    out: List[tuple] = []
    for a in nra.schema(node):
        k = kinds[a]
        if k == "path":
            out.append((f"{a}__vs", "array"))
            out.append((f"{a}__es", "array"))
        elif k == "var":
            out.append((a, "long"))
        elif k == "props":
            out.append((a, "map"))
        else:
            out.append((a, "string"))
    return out


# --------------------------------------------------------------- expressions

def _is_numeric_lit(e: ex.Expr) -> bool:
    return isinstance(e, ex.Lit) and isinstance(e.value, (int, float)) and not isinstance(e.value, bool)


def compile_expr(e: ex.Expr) -> Column:
    """Compile a scalar expression to a Spark Column.

    Typing: comparisons against a numeric literal cast both sides to double
    (property values are stored as strings; a non-numeric string casts to
    NULL, which fails the comparison — Cypher-compatible). All other
    comparisons use the operands' native types.
    """
    if isinstance(e, ex.Attr):
        return F.col(e.name)
    if isinstance(e, ex.Lit):
        return F.lit(e.value)
    if isinstance(e, ex.PropAccess):
        # Only reachable pre-rewrite; NRA/FRA trees substitute these away.
        raise ValueError(f"unresolved property access {e.var}.{e.key} — run the GRA→NRA rewrite")
    if isinstance(e, ex.Cmp):
        lc, rc = compile_expr(e.left), compile_expr(e.right)
        if _is_numeric_lit(e.left) or _is_numeric_lit(e.right):
            lc, rc = lc.cast("double"), rc.cast("double")
        return {
            "=": lc == rc,
            "<>": lc != rc,
            "<": lc < rc,
            "<=": lc <= rc,
            ">": lc > rc,
            ">=": lc >= rc,
        }[e.op]
    if isinstance(e, ex.And):
        return compile_expr(e.left) & compile_expr(e.right)
    if isinstance(e, ex.Or):
        return compile_expr(e.left) | compile_expr(e.right)
    if isinstance(e, ex.Not):
        return ~compile_expr(e.operand)
    raise TypeError(f"not an expression: {e!r}")


# ---------------------------------------------------------------- evaluation

def evaluate(node: nra.NraNode, ctx: EvalContext) -> DataFrame:
    """Evaluate an FRA plan to a DataFrame (bag semantics: duplicate rows)."""
    df = _eval(node, ctx)
    if ctx.instrument:
        ctx.rows_touched += df.count()
    return df


def _tick(ctx: EvalContext, df: DataFrame) -> DataFrame:
    if ctx.instrument:
        ctx.rows_touched += df.count()
    return df


def _eval(node: nra.NraNode, ctx: EvalContext) -> DataFrame:
    kids = [_tick(ctx, _eval(c, ctx)) for c in nra.children(node)]
    return eval_node(node, kids, ctx)


def eval_node(node: nra.NraNode, child_dfs: List[DataFrame], ctx: EvalContext) -> DataFrame:
    """Evaluate one operator given its children's (already evaluated) outputs.

    Shared by the recursive batch evaluator and by the IVM network's
    state initialization (which walks the plan bottom-up itself).
    """
    if isinstance(node, nra.GetVertices):
        df = ctx.alpha
        if node.label is not None:
            df = df.where(F.col("label") == F.lit(node.label))
        cols = [F.col("id").alias(node.var)]
        for key, attr in node.props.items():
            cols.append(F.element_at(F.col("properties"), F.lit(key)).alias(attr))
        if node.include_properties:
            cols.append(F.col("properties").alias(nra.props_attr(node.var)))
        return df.select(*cols)

    if isinstance(node, nra.GetEdges):
        df = ctx.beta
        if node.edge_type is not None:
            df = df.where(F.col("type") == F.lit(node.edge_type))
        s, d = ("src", "dst") if node.direction == "out" else ("dst", "src")
        cols = [
            F.col(s).alias(node.src_var),
            F.col("id").alias(node.edge_var),
            F.col(d).alias(node.dst_var),
        ]
        for key, attr in node.props.items():
            cols.append(F.element_at(F.col("properties"), F.lit(key)).alias(attr))
        if node.include_properties:
            cols.append(F.col("properties").alias(nra.props_attr(node.edge_var)))
        return df.select(*cols)

    if isinstance(node, nra.NaturalJoin):
        left, right = child_dfs
        keys = _join_keys(node.left, node.right)
        if not keys:
            return left.crossJoin(right)
        return left.join(right, on=keys, how="inner")

    if isinstance(node, nra.AntiJoin):
        left, right = child_dfs
        keys = _join_keys(node.left, node.right)
        if not keys:
            raise ValueError("uncorrelated AntiJoin (NOT EXISTS shares no variable)")
        return left.join(right.select(*keys).distinct(), on=keys, how="left_anti")

    if isinstance(node, nra.TransitiveJoin):
        left = child_dfs[0]
        seeds = left.select(F.col(node.src_attr).alias("seed")).distinct()
        paths = transitive_paths(
            ctx.beta,
            seeds,
            edge_type=node.edge_type,
            direction=node.direction,
            min_hops=node.min_hops,
            max_hops=node.max_hops,
        )
        paths = _tick(
            ctx,
            paths.select(
                F.col("root").alias(node.src_attr),
                F.col("cur").alias(node.dst_var),
                F.col("vs").alias(f"{node.path_var}__vs"),
                F.col("es").alias(f"{node.path_var}__es"),
            ),
        )
        return left.join(paths, on=[node.src_attr], how="inner")

    if isinstance(node, nra.Unnest):
        df = child_dfs[0]
        for var, key, attr in node.items:
            df = df.withColumn(attr, F.element_at(F.col(nra.props_attr(var)), F.lit(key)))
        return df

    if isinstance(node, nra.Selection):
        return child_dfs[0].where(compile_expr(node.predicate))

    if isinstance(node, nra.Projection):
        df = child_dfs[0]
        kinds = attr_kinds(node.child)
        cols: List[Column] = []
        for e, alias in node.items:
            if isinstance(e, ex.Attr) and kinds.get(e.name) == "path":
                cols.append(F.col(f"{e.name}__vs").alias(f"{alias}__vs"))
                cols.append(F.col(f"{e.name}__es").alias(f"{alias}__es"))
            else:
                cols.append(compile_expr(e).alias(alias))
        return df.select(*cols)

    if isinstance(node, nra.Distinct):
        return child_dfs[0].distinct()

    if isinstance(node, nra.AllDifferent):
        df = child_dfs[0]
        cond = all_different_condition(node.edge_vars, node.path_vars)
        return df.where(cond) if cond is not None else df

    if isinstance(node, nra.UnwindPath):
        df = child_dfs[0]
        return df.withColumn(node.out_var, F.explode(F.col(f"{node.path_var}__vs")))

    raise TypeError(f"not an NRA node: {node!r}")


def all_different_condition(edge_vars, path_vars) -> Optional[Column]:
    """Pairwise edge-disjointness condition (Cypher relationship uniqueness)."""
    conds: List[Column] = []
    evs = list(edge_vars)
    pvs = list(path_vars)
    for i in range(len(evs)):
        for j in range(i + 1, len(evs)):
            conds.append(F.col(evs[i]) != F.col(evs[j]))
    for e in evs:
        for p in pvs:
            conds.append(~F.array_contains(F.col(f"{p}__es"), F.col(e)))
    for i in range(len(pvs)):
        for j in range(i + 1, len(pvs)):
            conds.append(~F.arrays_overlap(F.col(f"{pvs[i]}__es"), F.col(f"{pvs[j]}__es")))
    if not conds:
        return None
    out = conds[0]
    for c in conds[1:]:
        out = out & c
    return out


def _join_keys(left: nra.NraNode, right: nra.NraNode) -> List[str]:
    """Shared scalar-variable attributes (the natural-join keys)."""
    lk, rk = attr_kinds(left), attr_kinds(right)
    ls, rs = set(nra.schema(left)), set(nra.schema(right))
    shared = ls & rs
    keys = sorted(a for a in shared if lk[a] == "var" and rk[a] == "var")
    non_keys = [a for a in shared if a not in keys]
    if non_keys:
        raise ValueError(f"non-variable attributes shared across join inputs: {non_keys}")
    return keys
