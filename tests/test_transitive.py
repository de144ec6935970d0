"""Unit tests for both transitive-closure fixpoints (batch and two-sided)."""
import math

import pandas as pd
import pytest

from repro.fra.transitive import oriented_edges, transitive_paths
from repro.graph.property_graph import PropertyGraph
from repro.ivm import state as st
from repro.ivm.transitive import TC_FIELDS, two_sided_closure


def chain_graph(n, etype="R"):
    return PropertyGraph.from_rows(
        [{"id": i, "label": "N", "properties": {}} for i in range(1, n + 1)],
        [
            {"id": 100 + i, "src": i, "dst": i + 1, "type": etype, "properties": {}}
            for i in range(1, n)
        ],
    )


def seeds_df(spark, ids):
    return spark.createDataFrame([(int(i),) for i in ids], "seed long")


def collect_paths(df):
    return sorted(
        (int(r["root"]), int(r["cur"]), tuple(r["es"])) for r in df.collect()
    )


# ------------------------------------------------------------ batch closure

def test_chain_all_paths(spark):
    g = chain_graph(4)
    out = transitive_paths(g.edges_df(spark), seeds_df(spark, [1, 2, 3, 4]), edge_type="R")
    got = collect_paths(out)
    assert len(got) == 6  # 3 + 2 + 1
    assert (1, 4, (101, 102, 103)) in got


def test_seeded_restriction(spark):
    g = chain_graph(4)
    out = transitive_paths(g.edges_df(spark), seeds_df(spark, [2]), edge_type="R")
    assert collect_paths(out) == [(2, 3, (102,)), (2, 4, (102, 103))]


def test_type_filter(spark):
    g = chain_graph(3, etype="S")
    out = transitive_paths(g.edges_df(spark), seeds_df(spark, [1]), edge_type="R")
    assert out.count() == 0


def test_direction_in(spark):
    g = chain_graph(3)
    out = transitive_paths(
        g.edges_df(spark), seeds_df(spark, [3]), edge_type="R", direction="in"
    )
    got = collect_paths(out)
    assert (3, 1, (102, 101)) in got and len(got) == 2


def test_hop_bounds(spark):
    g = chain_graph(5)
    out = transitive_paths(
        g.edges_df(spark), seeds_df(spark, [1]), edge_type="R", min_hops=2, max_hops=3
    )
    assert {len(es) for _r, _c, es in collect_paths(out)} == {2, 3}


def test_min_zero_includes_empty_path(spark):
    g = chain_graph(2)
    out = transitive_paths(
        g.edges_df(spark), seeds_df(spark, [1]), edge_type="R", min_hops=0
    )
    got = collect_paths(out)
    assert (1, 1, ()) in got and (1, 2, (101,)) in got


def test_cycle_trail_termination(spark):
    g = PropertyGraph.from_rows(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 2, "dst": 1, "type": "R", "properties": {}},
        ],
    )
    out = transitive_paths(g.edges_df(spark), seeds_df(spark, [1, 2]), edge_type="R")
    assert len(collect_paths(out)) == 4


def test_vertex_list_matches_edge_list(spark):
    g = chain_graph(3)
    out = transitive_paths(g.edges_df(spark), seeds_df(spark, [1]), edge_type="R")
    for r in out.collect():
        assert len(r["vs"]) == len(r["es"]) + 1


# -------------------------------------------------------- two-sided closure

def ins(rows):
    return pd.DataFrame(rows, columns=["id", "src", "dst"]).assign(**{st.MULT: 1})


def test_two_sided_single_edge_graph(spark):
    g = chain_graph(3)
    new, _rows = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(102, 2, 3)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=math.inf,
    )
    # paths using edge 102 in chain 1→2→3: (102), (101,102)
    assert sorted(tuple(t) for t in new["tc__es"]) == [(101, 102), (102,)]


def test_two_sided_middle_edge_combines(spark):
    # chains 1→2 and 3→4 joined by new edge 2→3
    g = PropertyGraph.from_rows(
        [{"id": i, "label": "N", "properties": {}} for i in range(1, 5)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 3, "dst": 4, "type": "R", "properties": {}},
            {"id": 20, "src": 2, "dst": 3, "type": "R", "properties": {}},  # "new"
        ],
    )
    new, _ = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(20, 2, 3)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=math.inf,
    )
    got = sorted(tuple(t) for t in new["tc__es"])
    assert got == [(10, 20), (10, 20, 11), (20,), (20, 11)]


def test_two_sided_no_duplicate_mults(spark):
    # cycle closure: path (11,20,10) reachable via two extension orders
    g = PropertyGraph.from_rows(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2, 3)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 2, "dst": 3, "type": "R", "properties": {}},
            {"id": 20, "src": 3, "dst": 1, "type": "R", "properties": {}},
        ],
    )
    new, _ = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(20, 3, 1)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=math.inf,
    )
    assert new["tc__es"].is_unique
    # every trail through edge 20 in the 3-cycle:
    # (20), (20,10), (20,10,11), (11,20), (11,20,10), (10,11,20)
    assert len(new) == 6


def test_two_sided_respects_max_hops(spark):
    g = chain_graph(6)
    new, _ = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(103, 3, 4)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=2,
    )
    assert all(len(t) <= 2 for t in new["tc__es"])


def test_two_sided_multiple_inserts(spark):
    g = chain_graph(4)
    new, _ = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(101, 1, 2), (103, 3, 4)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=math.inf,
    )
    assert new["tc__es"].is_unique
    got = set(tuple(t) for t in new["tc__es"])
    # all trails containing 101 or 103 in the 1→2→3→4 chain
    assert got == {(101,), (103,), (101, 102), (102, 103), (101, 102, 103)}


def test_oriented_edges_swap(spark):
    g = chain_graph(2)
    out = oriented_edges(g.edges_df(spark), "R", "in").collect()
    assert [(r["_s"], r["_d"], r["_e"]) for r in out] == [(2, 1, 101)]


def test_two_sided_counts_frontier_rows(spark):
    g = chain_graph(4)
    _new, rows = two_sided_closure(
        spark,
        g.edges_df(spark),
        ins([(101, 1, 2)]),
        edge_type="R",
        direction="out",
        min_hops=1,
        max_hops=math.inf,
    )
    assert rows >= 3
