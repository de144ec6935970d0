"""Trail-semantics transitive closure as a semi-naive DataFrame fixpoint.

Computes all paths over a typed edge set, carrying the *atomic path* payload
(vertex-id list + edge-id list) the paper's fragment requires: a path is an
ordered list, but it is only ever inserted/deleted as a unit. Cypher trail
semantics (no edge repeated within one path) makes the closure finite even
on cyclic graphs; the no-repeat guard is ``!array_contains(es, edge)``.

Used by the batch (full-recompute) evaluator, seeded by the left input's
source vertices. The IVM engine maintains the *unseeded* closure
incrementally in ``repro.ivm.transitive`` and shares :func:`extend_step`.
"""
from __future__ import annotations

import math
from typing import List, Optional

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Safety cap on fixpoint iterations: trails are bounded by |E|, but a bug
#: upstream (e.g. wrong join condition) must fail loudly, not loop forever.
MAX_ITERATIONS = 1000


class FixpointOverrunError(RuntimeError):
    """The closure loop exceeded MAX_ITERATIONS — a bug, not data."""


def oriented_edges(edges: DataFrame, edge_type: Optional[str], direction: str) -> DataFrame:
    """Project β to navigation triples ``(_s, _d, _e)`` honouring direction.

    ``direction='in'`` navigates edges backwards (the pattern
    ``(a)<-[:T*]-(b)`` walks target→source), implemented by swapping the
    endpoints here so the fixpoint only ever walks ``_s → _d``.
    """
    e = edges
    if edge_type is not None:
        e = e.where(F.col("type") == F.lit(edge_type))
    if direction == "out":
        return e.select(
            F.col("src").alias("_s"), F.col("dst").alias("_d"), F.col("id").alias("_e")
        )
    if direction == "in":
        return e.select(
            F.col("dst").alias("_s"), F.col("src").alias("_d"), F.col("id").alias("_e")
        )
    raise ValueError(f"bad direction {direction!r}")


def extend_step(frontier: DataFrame, nav: DataFrame) -> DataFrame:
    """One semi-naive step: extend every path by one unused edge at its end.

    ``frontier`` columns: ``root, cur, vs, es``; ``nav`` columns:
    ``_s, _d, _e`` (from :func:`oriented_edges`).
    """
    return (
        frontier.join(nav, frontier["cur"] == nav["_s"])
        .where(~F.array_contains(F.col("es"), F.col("_e")))
        .select(
            F.col("root"),
            F.col("_d").alias("cur"),
            F.concat(F.col("vs"), F.array(F.col("_d"))).alias("vs"),
            F.concat(F.col("es"), F.array(F.col("_e"))).alias("es"),
        )
    )


def transitive_paths(
    edges: DataFrame,
    seeds: DataFrame,
    *,
    edge_type: Optional[str],
    direction: str = "out",
    min_hops: int = 1,
    max_hops: float = math.inf,
) -> DataFrame:
    """All trails from ``seeds`` over typed edges, with path payloads.

    ``edges`` is the β relation (``id, src, dst, type, …``); ``seeds`` is a
    one-column DataFrame named ``seed`` (distinct source vertex ids).
    Returns columns ``root`` (seed), ``cur`` (path end), ``vs``
    (vertex-id list, root first) and ``es`` (edge-id list) — one row per
    path with ``min_hops ≤ length ≤ max_hops``.
    """
    nav = oriented_edges(edges, edge_type, direction)
    seed_col = seeds.select(F.col("seed").cast("long")).distinct()

    levels: List[DataFrame] = []
    if min_hops <= 0:
        levels.append(
            seed_col.select(
                F.col("seed").alias("root"),
                F.col("seed").alias("cur"),
                F.array(F.col("seed")).alias("vs"),
                F.array().cast("array<long>").alias("es"),
            )
        )

    frontier = (
        seed_col.join(nav, seed_col["seed"] == nav["_s"])
        .select(
            F.col("seed").alias("root"),
            F.col("_d").alias("cur"),
            F.array(F.col("seed"), F.col("_d")).alias("vs"),
            F.array(F.col("_e")).alias("es"),
        )
        .localCheckpoint(eager=True)
    )
    depth = 1
    while not frontier.isEmpty():
        if depth > MAX_ITERATIONS:
            raise FixpointOverrunError(f"transitive closure exceeded {MAX_ITERATIONS} hops")
        if depth >= min_hops:
            levels.append(frontier)
        if depth + 1 > max_hops:
            break
        frontier = extend_step(frontier, nav).localCheckpoint(eager=True)
        depth += 1

    if not levels:
        empty = seed_col.sparkSession.createDataFrame(
            [], "root long, cur long, vs array<long>, es array<long>"
        )
        return empty
    out = levels[0]
    for lv in levels[1:]:
        out = out.unionByName(lv)
    return out
