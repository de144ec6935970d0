"""IVM engine tests: per-operator maintenance vs. full recomputation.

Each test drives one operator class (or combination) through a transaction
sequence and checks the maintained view equals a from-scratch evaluation
after *every* transaction (`check_incremental_vs_recompute`).
"""
import pytest

from repro.graph import transactions as tx
from repro.graph.generators import example_graph
from repro.graph.property_graph import PropertyGraph

from tests.util import assert_bag_equal, check_incremental_vs_recompute

RUNNING_EXAMPLE = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"


def diamond_factory():
    return lambda: PropertyGraph.from_rows(
        [
            {"id": 1, "label": "N", "properties": {"name": "a", "v": "1"}},
            {"id": 2, "label": "N", "properties": {"name": "b", "v": "2"}},
            {"id": 3, "label": "N", "properties": {"name": "c"}},
            {"id": 4, "label": "M", "properties": {"name": "d", "v": "2"}},
        ],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {"w": "5"}},
            {"id": 11, "src": 1, "dst": 3, "type": "R", "properties": {}},
            {"id": 12, "src": 2, "dst": 4, "type": "R", "properties": {}},
            {"id": 13, "src": 3, "dst": 4, "type": "S", "properties": {}},
        ],
    )


# ------------------------------------------------------------------- scans

def test_scan_vertex_inserts_deletes(spark):
    txns = [
        tx.single(tx.AddVertex(100, "N", {"name": "z"})),
        tx.single(tx.AddVertex(101, "M")),
        tx.single(tx.DeleteVertex(100)),
    ]
    check_incremental_vs_recompute(spark, diamond_factory(), "MATCH (n:N) RETURN n", txns)


def test_scan_label_filtering(spark):
    txns = [tx.single(tx.AddVertex(100, "Other"))]
    check_incremental_vs_recompute(spark, diamond_factory(), "MATCH (n:N) RETURN n", txns)


def test_scan_property_projection(spark):
    txns = [
        tx.single(tx.SetProperty("vertex", 3, "v", "7")),
        tx.single(tx.RemoveProperty("vertex", 1, "v")),
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (n:N) RETURN n, n.v AS v", txns
    )


# ------------------------------------------------------------------- joins

def test_join_edge_churn(spark):
    txns = [
        tx.single(tx.AddEdge(20, 3, 4, "R")),
        tx.single(tx.DeleteEdge(10)),
        tx.Transaction([tx.AddVertex(5, "M"), tx.AddEdge(21, 4, 5, "R")]),
        tx.single(tx.DeleteVertex(2)),  # cascades edges 12 (and 10 already gone)
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (a)-[:R]->(b:M) RETURN a, b", txns
    )


def test_two_hop_join_churn(spark):
    txns = [
        tx.single(tx.AddEdge(20, 4, 1, "R")),
        tx.single(tx.DeleteEdge(11)),
        tx.single(tx.AddEdge(21, 2, 1, "R")),
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (a)-[:R]->(b)-[:R]->(c) RETURN a, b, c", txns
    )


def test_join_with_property_predicate(spark):
    txns = [
        tx.single(tx.SetProperty("vertex", 2, "v", "1")),  # makes 1→2 match
        tx.single(tx.SetProperty("vertex", 1, "v", "9")),  # unmakes it
        tx.single(tx.SetProperty("vertex", 4, "v", "9")),
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (a)-[:R]->(b) WHERE a.v = b.v RETURN a, b", txns
    )


def test_fgn_unread_property_no_view_delta(spark):
    from repro.core.session import prepare_view

    g = diamond_factory()()
    view = prepare_view(spark, g, "MATCH (a)-[:R]->(b) WHERE a.v = b.v RETURN a, b")
    view.initialize()
    stats = view.apply(tx.single(tx.SetProperty("vertex", 1, "name", "zzz")))
    # FGN: the view reads only 'v'; a 'name' update must die at the scans.
    assert stats.rows_touched == 0 and stats.view_delta_rows == 0


# -------------------------------------------------------------- transitive

def test_running_example_full_lifecycle(spark):
    txns = [
        tx.single(tx.SetProperty("vertex", 2, "author", "alice")),  # unread
        tx.single(tx.SetProperty("vertex", 4, "lang", "en")),  # thread 4→5 appears
        tx.Transaction([tx.AddVertex(6, "Comm", {"lang": "en"}), tx.AddEdge(13, 3, 6, "REPLY")]),
        tx.single(tx.DeleteEdge(11)),  # paths through 2→3 vanish atomically
        tx.single(tx.DeleteVertex(4)),  # cascade
        tx.single(tx.SetProperty("vertex", 1, "lang", "fr")),  # root lang flips
    ]
    check_incremental_vs_recompute(spark, example_graph, RUNNING_EXAMPLE, txns)


def test_transitive_insert_middle_edge(spark):
    """Inserting an edge that joins two existing chains: paths combine."""

    def factory():
        return PropertyGraph.from_rows(
            [{"id": i, "label": "N", "properties": {}} for i in range(1, 7)],
            [
                {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
                {"id": 11, "src": 2, "dst": 3, "type": "R", "properties": {}},
                {"id": 12, "src": 4, "dst": 5, "type": "R", "properties": {}},
                {"id": 13, "src": 5, "dst": 6, "type": "R", "properties": {}},
            ],
        )

    txns = [
        tx.single(tx.AddEdge(20, 3, 4, "R")),  # joins 1-2-3 with 4-5-6
        tx.single(tx.DeleteEdge(20)),  # splits again
    ]
    check_incremental_vs_recompute(
        spark, factory, "MATCH t = (a)-[:R*]->(b) RETURN a, b, t", txns
    )


def test_transitive_cycle_insert(spark):
    def factory():
        return PropertyGraph.from_rows(
            [{"id": i, "label": "N", "properties": {}} for i in (1, 2, 3)],
            [
                {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
                {"id": 11, "src": 2, "dst": 3, "type": "R", "properties": {}},
            ],
        )

    txns = [
        tx.single(tx.AddEdge(20, 3, 1, "R")),  # closes a 3-cycle
        tx.single(tx.DeleteEdge(11)),  # breaks it
    ]
    check_incremental_vs_recompute(
        spark, factory, "MATCH t = (a)-[:R*]->(b) RETURN a, b, t", txns
    )


def test_transitive_bounded_hops(spark):
    def factory():
        return PropertyGraph.from_rows(
            [{"id": i, "label": "N", "properties": {}} for i in range(1, 6)],
            [
                {"id": 10 + i, "src": i, "dst": i + 1, "type": "R", "properties": {}}
                for i in range(1, 5)
            ],
        )

    txns = [
        tx.Transaction([tx.AddVertex(6, "N"), tx.AddEdge(20, 5, 6, "R")]),
        tx.single(tx.DeleteEdge(12)),
    ]
    check_incremental_vs_recompute(
        spark, factory, "MATCH t = (a)-[:R*2..3]->(b) RETURN a, b, t", txns
    )


def test_transitive_min_zero(spark):
    def factory():
        return PropertyGraph.from_rows(
            [
                {"id": 1, "label": "M", "properties": {}},
                {"id": 2, "label": "N", "properties": {}},
            ],
            [],
        )

    txns = [
        tx.single(tx.AddVertex(3, "M")),
        tx.single(tx.AddEdge(10, 1, 2, "R")),
        tx.single(tx.DeleteVertex(1)),
    ]
    check_incremental_vs_recompute(
        spark, factory, "MATCH t = (a:M)-[:R*0..]->(b) RETURN a, b, t", txns
    )


def test_transitive_endpoint_label_change(spark):
    """Changing a vertex label scan (delete + re-add with other label)."""

    def factory():
        return example_graph()

    txns = [
        # replace Comm 3 by a Post with same id edges gone; rebuild as Comm
        tx.single(tx.DeleteVertex(3)),
        tx.Transaction([tx.AddVertex(3, "Comm", {"lang": "en"}), tx.AddEdge(11, 2, 3, "REPLY")]),
    ]
    check_incremental_vs_recompute(spark, factory, RUNNING_EXAMPLE, txns)


# ---------------------------------------------------------------- distinct

def test_distinct_maintenance(spark):
    txns = [
        tx.single(tx.AddEdge(20, 1, 4, "R")),  # 1 now reaches two M? (4 is M)
        tx.single(tx.DeleteEdge(10)),
        tx.single(tx.DeleteEdge(20)),
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (a)-[:R]->(b) RETURN DISTINCT a", txns
    )


# ---------------------------------------------------------------- antijoin

def test_antijoin_maintenance(spark):
    txns = [
        tx.single(tx.AddEdge(20, 3, 2, "R")),  # 3 gains an R successor
        tx.single(tx.DeleteEdge(12)),  # 2 loses its R successor
        tx.single(tx.AddVertex(7, "N")),  # new N with no successors
        tx.single(tx.DeleteVertex(3)),
    ]
    check_incremental_vs_recompute(
        spark,
        diamond_factory(),
        "MATCH (a:N) WHERE NOT EXISTS { (a)-[:R]->(x) } RETURN a",
        txns,
    )


# ------------------------------------------------------------------ unwind

def test_unwind_maintenance(spark):
    txns = [
        tx.Transaction([tx.AddVertex(6, "Comm", {"lang": "en"}), tx.AddEdge(13, 2, 6, "REPLY")]),
        tx.single(tx.DeleteEdge(11)),
    ]
    q = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) UNWIND nodes(t) AS n RETURN p, n"
    check_incremental_vs_recompute(spark, example_graph, q, txns)


# ----------------------------------------------------------- alldifferent

def test_alldifferent_maintenance(spark):
    def factory():
        return PropertyGraph.from_rows(
            [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
            [{"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}}],
        )

    txns = [
        tx.single(tx.AddEdge(11, 2, 1, "R")),  # enables x-y-z via two edges
        tx.single(tx.DeleteEdge(10)),
    ]
    check_incremental_vs_recompute(
        spark, factory, "MATCH (x)-[:R]->(y)-[:R]->(z) RETURN x, y, z", txns
    )


# ----------------------------------------------------------- baseline mode

def test_no_pushdown_mode_maintenance(spark):
    txns = [
        tx.single(tx.SetProperty("vertex", 4, "lang", "en")),
        tx.single(tx.DeleteEdge(10)),
    ]
    check_incremental_vs_recompute(
        spark, example_graph, RUNNING_EXAMPLE, txns, pushdown=False
    )


# -------------------------------------------------------------- edge props

def test_edge_property_filter_maintenance(spark):
    txns = [
        tx.single(tx.SetProperty("edge", 11, "w", "5")),
        tx.single(tx.SetProperty("edge", 10, "w", "6")),
        tx.single(tx.RemoveProperty("edge", 11, "w")),
    ]
    check_incremental_vs_recompute(
        spark, diamond_factory(), "MATCH (a)-[e:R]->(b) WHERE e.w = '5' RETURN a, b", txns
    )


def test_edge_property_change_does_not_rebuild_paths(spark):
    """Structural netting: an edge property update must not touch the TC."""
    from repro.core.session import prepare_view

    g = example_graph()
    view = prepare_view(spark, g, RUNNING_EXAMPLE)
    view.initialize()
    stats = view.apply(tx.single(tx.SetProperty("edge", 10, "w", "1")))
    assert stats.rows_touched == 0
