"""Incremental trail-closure maintenance: the two-sided extension fixpoint.

Insertion rule for the maintained transitive closure (paper §4: transitive
operations are incrementally evaluable even though not first-order
[Bergmann'12, Pang'05]): every *new* trail contains at least one inserted
edge, and any trail containing edge e can be built from the single-edge
path ⟨e⟩ by repeatedly appending one edge on the right or prepending one
on the left — each intermediate step is itself a valid trail. So the
fixpoint seeds from the inserted edges and extends both sides over the
*post-transaction* edge set, deduplicating on the edge sequence (the same
trail is reachable from each of its inserted edges and from interleaved
extension orders).

Deletion needs no fixpoint at all — atomic paths make it a filter (handled
in :class:`~repro.ivm.nodes.TransitiveJoinNode`).
"""
from __future__ import annotations

import math
from typing import Optional, Set, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.fra.transitive import MAX_ITERATIONS, FixpointOverrunError, oriented_edges
from repro.ivm import state as st

#: Typed fields of the maintained closure relation.
TC_FIELDS = [("src", "long"), ("dst", "long"), ("tc__vs", "array"), ("tc__es", "array")]
TC_COLS = [c for c, _t in TC_FIELDS]


def two_sided_closure(
    spark: SparkSession,
    beta_now: DataFrame,
    inserted: pd.DataFrame,
    *,
    edge_type: Optional[str],
    direction: str,
    min_hops: int,
    max_hops: float,
) -> Tuple[pd.DataFrame, int]:
    """All trails using ≥1 inserted edge, with length in [min_hops, max_hops].

    ``inserted`` rows carry ``id``/``src``/``dst`` already oriented in
    navigation direction. Returns ``(new_paths, frontier_rows)`` where
    ``new_paths`` has the TC columns + ``__mult`` = 1 and ``frontier_rows``
    counts every intermediate row processed (the rows-touched metric).
    """
    nav = oriented_edges(beta_now, edge_type, direction)

    frontier = pd.DataFrame(
        {
            "src": inserted["src"].astype("int64"),
            "dst": inserted["dst"].astype("int64"),
            "tc__vs": [(int(s), int(d)) for s, d in zip(inserted["src"], inserted["dst"])],
            "tc__es": [(int(e),) for e in inserted["id"]],
            st.MULT: 1,
        }
    ).reset_index(drop=True)

    seen: Set[tuple] = set(frontier["tc__es"])
    accepted = [frontier]
    frontier_rows = len(frontier)

    iters = 0
    while not frontier.empty:
        iters += 1
        if iters > MAX_ITERATIONS:
            raise FixpointOverrunError(f"two-sided closure exceeded {MAX_ITERATIONS} rounds")
        f = st.lift(spark, frontier, TC_FIELDS)
        if max_hops != math.inf:
            f = f.where(F.size(F.col("tc__es")) < F.lit(int(max_hops)))
        right = (
            f.join(nav, f["dst"] == nav["_s"])
            .where(~F.array_contains(F.col("tc__es"), F.col("_e")))
            .select(
                F.col("src"),
                F.col("_d").alias("dst"),
                F.concat(F.col("tc__vs"), F.array(F.col("_d"))).alias("tc__vs"),
                F.concat(F.col("tc__es"), F.array(F.col("_e"))).alias("tc__es"),
                F.col(st.MULT),
            )
        )
        left = (
            f.join(nav, f["src"] == nav["_d"])
            .where(~F.array_contains(F.col("tc__es"), F.col("_e")))
            .select(
                F.col("_s").alias("src"),
                F.col("dst"),
                F.concat(F.array(F.col("_s")), F.col("tc__vs")).alias("tc__vs"),
                F.concat(F.array(F.col("_e")), F.col("tc__es")).alias("tc__es"),
                F.col(st.MULT),
            )
        )
        batch = st.collect(right.unionByName(left), TC_FIELDS)
        if batch.empty:
            break
        # The edge sequence identifies a path completely, so dedup on it —
        # both against earlier rounds (a trail is reachable from each of its
        # inserted edges) and within the batch (left/right extension orders
        # interleave: a∘e∘b arrives as both (a∘e)∘b and a∘(e∘b)).
        batch = batch.drop_duplicates(subset="tc__es")
        fresh_mask = [es not in seen for es in batch["tc__es"]]
        frontier = batch[fresh_mask].reset_index(drop=True)
        seen.update(frontier["tc__es"])
        frontier_rows += len(frontier)
        if not frontier.empty:
            accepted.append(frontier)

    all_new = pd.concat(accepted, ignore_index=True)
    lengths = all_new["tc__es"].apply(len)
    mask = lengths >= min_hops
    if max_hops != math.inf:
        mask &= lengths <= int(max_hops)
    return all_new[mask].reset_index(drop=True), frontier_rows
