"""Dataflow nodes: per-operator incremental maintenance (paper §4 step 4).

One node per FRA operator, each holding its materialized output state
(driver-side bag with multiplicities, see ``repro.ivm.state``) and a
``apply_delta`` method implementing the classical bag-delta rules
[Blakeley'86, Griffin/Libkin'95, Gupta/Mumick'93]:

* scans       — project the α/β transaction delta (FGN falls out of bag
                normalization: an update to a property the scan does not
                read nets to the empty delta);
* σ / π / μ / AllDifferent / UnwindPath — stateless: delta in, delta out;
* ⋈           — Δ(L⋈R) = ΔL⋈R' + L'⋈ΔR − ΔL⋈ΔR  (primed = post-update
                state; children are updated before parents);
* δ(distinct) — support counting on the child's bag;
* ▷ (NOT EXISTS) — affected-key partial recomputation;
* ⋈*          — incremental trail closure with **atomic paths**: deletions
                drop every stored path whose edge list meets the deleted
                edges; insertions run a two-sided extension fixpoint seeded
                from the new edges (``repro.ivm.transitive``).

All relational work (joins, filters, explode, closure steps) executes
through Spark SQL on lifted DataFrames.
"""
from __future__ import annotations

from typing import List, Optional

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.algebra import expr as ex
from repro.algebra import nra
from repro.fra.eval_spark import (
    EvalContext,
    all_different_condition,
    attr_kinds,
    compile_expr,
    eval_node,
    physical_fields,
    _join_keys,
)
from repro.fra.transitive import oriented_edges, transitive_paths
from repro.ivm import state as st
from repro.ivm.maintenance import TxnInput
from repro.ivm.transitive import TC_FIELDS, two_sided_closure

MULT = st.MULT


class DataflowNode:
    """Base: materialized output state + delta propagation."""

    def __init__(self, algebra, children: List["DataflowNode"]):
        self.algebra = algebra
        self.children = children
        self.fields = physical_fields(algebra)
        self.cols: List[str] = st.names(self.fields)
        self.state: pd.DataFrame = st.empty_state(self.fields)
        #: extra internal rows processed in the last apply_delta (closure
        #: frontiers etc.) — counted into the rows-touched metric.
        self.extra_rows: int = 0

    # -- initialization ---------------------------------------------------
    def initialize(self, child_dfs: List[DataFrame], ctx: EvalContext) -> DataFrame:
        """Full evaluation of this operator; also materializes state.

        Returns the bag DataFrame (no mult column) for parents to build on.
        """
        df = eval_node(self.algebra, child_dfs, ctx)
        self._set_state_from_bag(df)
        return df

    def _set_state_from_bag(self, df: DataFrame) -> None:
        pdf = st.collect(df.withColumn(MULT, F.lit(1)), self.fields)
        self.state = st.normalize(pdf, self.fields)

    # -- delta ------------------------------------------------------------
    def apply_delta(self, child_deltas: List[pd.DataFrame], txn: TxnInput) -> pd.DataFrame:
        """Compute the output delta and fold it into the state."""
        self.extra_rows = 0
        delta = self._delta(child_deltas, txn)
        delta = st.normalize(delta, self.fields)
        self.state = st.add(self.state, delta, self.fields)
        return delta

    def _delta(self, child_deltas: List[pd.DataFrame], txn: TxnInput) -> pd.DataFrame:
        raise NotImplementedError

    # -- helpers ----------------------------------------------------------
    def _lift(self, txn: TxnInput, pdf: pd.DataFrame, fields=None) -> DataFrame:
        return st.lift(txn.spark, pdf, fields if fields is not None else self.fields)


class ScanVerticesNode(DataflowNode):
    """○ leaf: reacts to the α transaction delta."""

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        if not (txn.delta.v_inserts or txn.delta.v_deletes):
            return st.empty_state(self.fields)
        node: nra.GetVertices = self.algebra
        df = txn.alpha_delta()
        if node.label is not None:
            df = df.where(F.col("label") == F.lit(node.label))
        cols = [F.col("id").alias(node.var)]
        for key, attr in node.props.items():
            cols.append(F.element_at(F.col("properties"), F.lit(key)).alias(attr))
        if node.include_properties:
            cols.append(F.col("properties").alias(nra.props_attr(node.var)))
        cols.append(F.col(MULT))
        return st.collect(df.select(*cols), self.fields)


class ScanEdgesNode(DataflowNode):
    """⇑ leaf: reacts to the β transaction delta."""

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        if not (txn.delta.e_inserts or txn.delta.e_deletes):
            return st.empty_state(self.fields)
        node: nra.GetEdges = self.algebra
        df = txn.beta_delta()
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
        cols.append(F.col(MULT))
        return st.collect(df.select(*cols), self.fields)


class _StatelessNode(DataflowNode):
    """σ/π/μ/AllDifferent/Unwind: output delta is a pure function of input delta."""

    def _transform(self, df: DataFrame) -> DataFrame:
        raise NotImplementedError

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        d = child_deltas[0]
        if d.empty:
            return st.empty_state(self.fields)
        lifted = st.lift(txn.spark, d, self.children[0].fields)
        return st.collect(self._transform(lifted), self.fields)


class FilterNode(_StatelessNode):
    def _transform(self, df: DataFrame) -> DataFrame:
        return df.where(compile_expr(self.algebra.predicate))


class AllDifferentNode(_StatelessNode):
    def _transform(self, df: DataFrame) -> DataFrame:
        cond = all_different_condition(self.algebra.edge_vars, self.algebra.path_vars)
        return df if cond is None else df.where(cond)


class UnnestNode(_StatelessNode):
    """μ in the no-pushdown baseline: map lookups on the shipped props maps."""

    def _transform(self, df: DataFrame) -> DataFrame:
        for var, key, attr in self.algebra.items:
            df = df.withColumn(attr, F.element_at(F.col(nra.props_attr(var)), F.lit(key)))
        return df


class UnwindNode(_StatelessNode):
    def _transform(self, df: DataFrame) -> DataFrame:
        return df.withColumn(self.algebra.out_var, F.explode(F.col(f"{self.algebra.path_var}__vs")))


class ProjectNode(_StatelessNode):
    def _transform(self, df: DataFrame) -> DataFrame:
        kinds = attr_kinds(self.algebra.child)
        cols: List[Column] = []
        for e, alias in self.algebra.items:
            if isinstance(e, ex.Attr) and kinds.get(e.name) == "path":
                cols.append(F.col(f"{e.name}__vs").alias(f"{alias}__vs"))
                cols.append(F.col(f"{e.name}__es").alias(f"{alias}__es"))
            else:
                cols.append(compile_expr(e).alias(alias))
        cols.append(F.col(MULT))
        return df.select(*cols)


def _mult_join(
    left: DataFrame, right: DataFrame, keys: List[str], sign: int = 1
) -> DataFrame:
    """Inner join two mult-relations; multiplicities multiply (× sign)."""
    l = left.withColumnRenamed(MULT, "__ml")
    r = right.withColumnRenamed(MULT, "__mr")
    joined = l.join(r, on=keys, how="inner") if keys else l.crossJoin(r)
    return joined.withColumn(MULT, F.col("__ml") * F.col("__mr") * F.lit(sign)).drop(
        "__ml", "__mr"
    )


class JoinNode(DataflowNode):
    """⋈: Δ = ΔL⋈R' + L'⋈ΔR − ΔL⋈ΔR (children already updated)."""

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        dl, dr = child_deltas
        if dl.empty and dr.empty:
            return st.empty_state(self.fields)
        lnode, rnode = self.children
        keys = _join_keys(self.algebra.left, self.algebra.right)
        terms: List[DataFrame] = []
        if not dl.empty:
            terms.append(
                _mult_join(self._lift(txn, dl, lnode.fields), self._lift(txn, rnode.state, rnode.fields), keys)
            )
        if not dr.empty:
            terms.append(
                _mult_join(self._lift(txn, lnode.state, lnode.fields), self._lift(txn, dr, rnode.fields), keys)
            )
        if not dl.empty and not dr.empty:
            terms.append(
                _mult_join(self._lift(txn, dl, lnode.fields), self._lift(txn, dr, rnode.fields), keys, sign=-1)
            )
        out = terms[0]
        for t in terms[1:]:
            out = out.unionByName(t)
        ordered = [c for c in self.cols] + [MULT]
        return st.collect(out.select(*ordered), self.fields)


class DistinctNode(DataflowNode):
    """δ: support counting over the child's (updated) bag state."""

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        d = child_deltas[0]
        if d.empty:
            return st.empty_state(self.fields)
        child = self.children[0]
        cols = self.cols
        dg = st.lift(txn.spark, d, self.fields).groupBy(*cols).agg(F.sum(MULT).alias("__dm"))
        after = (
            st.lift(txn.spark, child.state, child.fields)
            .groupBy(*cols)
            .agg(F.sum(MULT).alias("__after"))
        )
        j = dg.join(after, on=cols, how="left").select(
            *cols,
            F.coalesce(F.col("__after"), F.lit(0)).alias("__after"),
            F.col("__dm"),
        )
        j = j.withColumn("__before", F.col("__after") - F.col("__dm"))
        out = j.select(
            *cols,
            F.when((F.col("__after") > 0) & (F.col("__before") <= 0), F.lit(1))
            .when((F.col("__after") <= 0) & (F.col("__before") > 0), F.lit(-1))
            .otherwise(F.lit(0))
            .alias(MULT),
        ).where(F.col(MULT) != 0)
        return st.collect(out, self.fields)


class AntiJoinNode(DataflowNode):
    """▷ (NOT EXISTS): affected-key partial recomputation.

    For the join keys touched by either input delta, recompute the
    anti-join over the children's *current* states and diff against the
    previously materialized output restricted to those keys. This is the
    standard change-propagation fallback for non-monotonic operators; the
    work is proportional to the affected keys, not the relation
    (DESIGN.md §5 — our extension beyond the paper's minimal fragment).
    """

    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        dl, dr = child_deltas
        if dl.empty and dr.empty:
            return st.empty_state(self.fields)
        lnode, rnode = self.children
        keys = _join_keys(self.algebra.left, self.algebra.right)
        key_fields = [(k, "long") for k in keys]
        affected = pd.concat(
            [d[keys] for d in (dl, dr) if not d.empty], ignore_index=True
        ).drop_duplicates()
        affected[MULT] = 1
        kdf = st.lift(txn.spark, affected, key_fields).drop(MULT)

        l_now = st.lift(txn.spark, lnode.state, lnode.fields).join(kdf, on=keys, how="left_semi")
        r_keys = (
            st.lift(txn.spark, rnode.state, rnode.fields).select(*keys).distinct()
        )
        new_out = l_now.join(r_keys, on=keys, how="left_anti")
        new_pdf = st.collect(new_out.select(*(self.cols + [MULT])), self.fields)

        old_pdf = self.state.merge(affected[keys].drop_duplicates(), on=keys, how="inner")
        return pd.concat([new_pdf, st.negate(old_pdf)], ignore_index=True)


class TransitiveJoinNode(DataflowNode):
    """⋈*: maintained trail closure with atomic paths + ordinary join delta.

    Internal state ``tc`` holds the *unseeded* closure of the typed edge
    set: every trail with length in [max(1, min_hops), max_hops], columns
    ``(src, dst, tc__vs, tc__es, __mult)`` — multiplicity is always 1, a
    path is set-like (its edge sequence identifies it). Edge deletions
    remove exactly the stored paths whose edge list intersects the deleted
    ids (the paper's atomic-path semantics); insertions grow the closure
    with the two-sided extension fixpoint. The node output is the join of
    the left input with ``tc`` (plus zero-length rows when min_hops = 0).
    """

    TC_FIELDS = TC_FIELDS

    def __init__(self, algebra, children):
        super().__init__(algebra, children)
        self.tc: pd.DataFrame = st.empty_state(self.TC_FIELDS)

    # -- init -------------------------------------------------------------
    def initialize(self, child_dfs: List[DataFrame], ctx: EvalContext) -> DataFrame:
        node: nra.TransitiveJoin = self.algebra
        nav = oriented_edges(ctx.beta, node.edge_type, node.direction)
        seeds = nav.select(F.col("_s").alias("seed")).distinct()
        paths = transitive_paths(
            ctx.beta,
            seeds,
            edge_type=node.edge_type,
            direction=node.direction,
            min_hops=max(1, node.min_hops),
            max_hops=node.max_hops,
        ).select(
            F.col("root").alias("src"),
            F.col("cur").alias("dst"),
            F.col("vs").alias("tc__vs"),
            F.col("es").alias("tc__es"),
        )
        self.tc = st.normalize(
            st.collect(paths.withColumn(MULT, F.lit(1)), self.TC_FIELDS), self.TC_FIELDS
        )
        out = self._join_bag(child_dfs[0], ctx)
        self._set_state_from_bag(out)
        return out

    def _paths_df(self, spark_or_txn, tc_pdf: pd.DataFrame) -> DataFrame:
        node: nra.TransitiveJoin = self.algebra
        spark = spark_or_txn.spark if isinstance(spark_or_txn, TxnInput) else spark_or_txn
        return st.lift(spark, tc_pdf, self.TC_FIELDS).select(
            F.col("src").alias(node.src_attr),
            F.col("dst").alias(node.dst_var),
            F.col("tc__vs").alias(f"{node.path_var}__vs"),
            F.col("tc__es").alias(f"{node.path_var}__es"),
            F.col(MULT),
        )

    def _join_bag(self, left: DataFrame, ctx: EvalContext) -> DataFrame:
        """Bag (no-mult) join for initialization."""
        node: nra.TransitiveJoin = self.algebra
        paths = self._paths_df(ctx.spark, self.tc).drop(MULT)
        out = left.join(paths, on=[node.src_attr], how="inner")
        if node.min_hops <= 0:
            zero = left.select(
                "*",
                F.col(node.src_attr).alias(node.dst_var),
                F.array(F.col(node.src_attr)).alias(f"{node.path_var}__vs"),
                F.array().cast("array<long>").alias(f"{node.path_var}__es"),
            )
            out = out.unionByName(zero)
        return out

    # -- delta ------------------------------------------------------------
    def _delta(self, child_deltas, txn: TxnInput) -> pd.DataFrame:
        node: nra.TransitiveJoin = self.algebra
        dl = child_deltas[0]
        dtc = self._maintain_tc(txn)

        if dl.empty and dtc.empty:
            return st.empty_state(self.fields)

        lnode = self.children[0]
        keys = [node.src_attr]
        terms: List[DataFrame] = []
        if not dl.empty:
            terms.append(
                _mult_join(self._lift(txn, dl, lnode.fields), self._paths_df(txn, self.tc), keys)
            )
            if node.min_hops <= 0:
                zero = st.lift(txn.spark, dl, lnode.fields).select(
                    "*",
                    F.col(node.src_attr).alias(node.dst_var),
                    F.array(F.col(node.src_attr)).alias(f"{node.path_var}__vs"),
                    F.array().cast("array<long>").alias(f"{node.path_var}__es"),
                )
                zero = zero.select(*(self.cols + [MULT]))
                terms.append(zero)
        if not dtc.empty:
            terms.append(
                _mult_join(
                    self._lift(txn, lnode.state, lnode.fields), self._paths_df(txn, dtc), keys
                )
            )
        if not dl.empty and not dtc.empty:
            terms.append(
                _mult_join(
                    self._lift(txn, dl, lnode.fields), self._paths_df(txn, dtc), keys, sign=-1
                )
            )
        out = terms[0]
        for t in terms[1:]:
            out = out.unionByName(t)
        ordered = self.cols + [MULT]
        return st.collect(out.select(*ordered), self.fields)

    def _maintain_tc(self, txn: TxnInput) -> pd.DataFrame:
        """Update the closure from the structural edge delta; return Δtc."""
        node: nra.TransitiveJoin = self.algebra
        sed = txn.structural_edge_delta()
        if node.edge_type is not None and not sed.empty:
            sed = sed[sed["type"] == node.edge_type]
        if sed.empty:
            return st.empty_state(self.TC_FIELDS)
        if node.direction == "in":
            sed = sed.rename(columns={"src": "dst", "dst": "src"})

        parts: List[pd.DataFrame] = []
        deleted_ids = set(sed.loc[sed[MULT] < 0, "id"])
        if deleted_ids:
            mask = self.tc["tc__es"].apply(lambda es: any(e in deleted_ids for e in es))
            removed = self.tc[mask]
            self.tc = self.tc[~mask].reset_index(drop=True)
            if not removed.empty:
                parts.append(st.negate(removed))

        inserted = sed[sed[MULT] > 0]
        if not inserted.empty:
            new_paths, frontier_rows = two_sided_closure(
                txn.spark,
                txn.beta_now(),
                inserted,
                edge_type=node.edge_type,
                direction=node.direction,
                min_hops=max(1, node.min_hops),
                max_hops=node.max_hops,
            )
            self.extra_rows += frontier_rows
            if not new_paths.empty:
                parts.append(new_paths)
                self.tc = pd.concat([self.tc, new_paths], ignore_index=True)

        if not parts:
            return st.empty_state(self.TC_FIELDS)
        return st.normalize(pd.concat(parts, ignore_index=True), self.TC_FIELDS)
