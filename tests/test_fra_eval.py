"""Batch (full-recompute) FRA evaluator tests, oracle-checked where possible."""
import pandas as pd
import pytest

from repro.graph import transactions as tx
from repro.graph.property_graph import PropertyGraph

from tests.util import TRAIL_CTE, assert_bag_equal, oracle_query, path_col_to_str, run_batch


def graph_of(vertices, edges):
    return PropertyGraph.from_rows(vertices, edges)


@pytest.fixture(scope="module")
def diamond():
    """a→b, a→c, b→d, c→d (two R-paths a⇒d) + labels/properties."""
    return graph_of(
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


# ----------------------------------------------------------------- scans

def test_get_vertices_label(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n:N) RETURN n")
    assert sorted(got["n"]) == [1, 2, 3]


def test_get_vertices_all_labels(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n) RETURN n")
    assert sorted(got["n"]) == [1, 2, 3, 4]


def test_property_projection(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n:N) RETURN n, n.name AS nm")
    expected = oracle_query(
        diamond, "SELECT id AS n, p_name AS nm FROM vertices WHERE label='N'", "name"
    )
    assert_bag_equal(got, expected)


def test_missing_property_is_null(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n:N) RETURN n, n.v AS v")
    row = got.set_index("n").loc[3]
    assert row["v"] is None


# ----------------------------------------------------------------- expand

def test_single_hop(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b) RETURN a, b")
    expected = oracle_query(diamond, "SELECT src AS a, dst AS b FROM edges WHERE type='R'")
    assert_bag_equal(got, expected)


def test_single_hop_reverse(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)<-[:R]-(b) RETURN a, b")
    expected = oracle_query(diamond, "SELECT dst AS a, src AS b FROM edges WHERE type='R'")
    assert_bag_equal(got, expected)


def test_untyped_hop(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[]->(b) RETURN a, b")
    expected = oracle_query(diamond, "SELECT src AS a, dst AS b FROM edges")
    assert_bag_equal(got, expected)


def test_dst_label_filter(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b:M) RETURN a, b")
    expected = oracle_query(
        diamond,
        "SELECT e.src AS a, e.dst AS b FROM edges e JOIN vertices v ON v.id=e.dst "
        "WHERE e.type='R' AND v.label='M'",
    )
    assert_bag_equal(got, expected)


def test_two_hop_join(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b)-[:R]->(c) RETURN a, b, c")
    expected = oracle_query(
        diamond,
        "SELECT e1.src AS a, e1.dst AS b, e2.dst AS c FROM edges e1 "
        "JOIN edges e2 ON e2.src = e1.dst AND e2.id <> e1.id "
        "WHERE e1.type='R' AND e2.type='R'",
    )
    assert_bag_equal(got, expected)


def test_edge_variable_returned(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[e:R]->(b) RETURN e")
    assert sorted(got["e"]) == [10, 11, 12]


def test_edge_property_filter(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[e:R]->(b) WHERE e.w = '5' RETURN a, b")
    assert got.to_dict("records") == [{"a": 1, "b": 2}]


# ------------------------------------------------------------- predicates

def test_property_join_predicate(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b) WHERE a.v = b.v RETURN a, b")
    # 2→4 matches (v='2' both); 1→2 differs; 1→3 has NULL on b (dropped)
    assert got.to_dict("records") == [{"a": 2, "b": 4}]


def test_numeric_comparison(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n:N) WHERE n.v >= 2 RETURN n")
    assert sorted(got["n"]) == [2]  # '1'<2, missing → NULL → dropped


def test_or_predicate(spark, diamond):
    got = run_batch(
        spark, diamond, "MATCH (n) WHERE n.name = 'a' OR n.name = 'd' RETURN n"
    )
    assert sorted(got["n"]) == [1, 4]


def test_not_predicate(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (n:N) WHERE NOT n.name = 'a' RETURN n")
    # NOT over NULL (missing name is impossible here; all N have names)
    assert sorted(got["n"]) == [2, 3]


# ------------------------------------------------------------- transitive

def test_transitive_paths_diamond(spark, diamond):
    got = run_batch(spark, diamond, "MATCH t = (a)-[:R*]->(b) RETURN a, b, t")
    got = path_col_to_str(got, "t__vs", "t").drop(columns=["t__es"])
    sql = TRAIL_CTE.format(type="R") + "SELECT root AS a, cur AS b, vstr AS t FROM paths"
    assert_bag_equal(got, oracle_query(diamond, sql))


def test_transitive_bounded(spark, diamond):
    got = run_batch(spark, diamond, "MATCH t = (a)-[:R*2..2]->(b) RETURN a, b")
    # exactly the two 2-hop paths 1→2→4? only 1→2→4 (2→4 is R), 1→3→4 is S on last hop
    assert got.to_dict("records") == [{"a": 1, "b": 4}]


def test_transitive_min_zero(spark, diamond):
    got = run_batch(spark, diamond, "MATCH t = (a:M)-[:R*0..]->(b) RETURN a, b")
    # vertex 4 has no outgoing R: only the zero-length path
    assert got.to_dict("records") == [{"a": 4, "b": 4}]


def test_transitive_on_cycle_terminates(spark):
    g = graph_of(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 2, "dst": 1, "type": "R", "properties": {}},
        ],
    )
    got = run_batch(spark, g, "MATCH t = (a)-[:R*]->(b) RETURN a, b, t")
    got = path_col_to_str(got, "t__vs", "t").drop(columns=["t__es"])
    sql = TRAIL_CTE.format(type="R") + "SELECT root AS a, cur AS b, vstr AS t FROM paths"
    assert_bag_equal(got, oracle_query(g, sql))
    # trails: 1→2, 2→1, 1→2→1, 2→1→2 — no infinite loop
    assert len(got) == 4


def test_parallel_edges_give_two_paths(spark):
    g = graph_of(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 1, "dst": 2, "type": "R", "properties": {}},
        ],
    )
    got = run_batch(spark, g, "MATCH t = (a)-[:R*]->(b) RETURN a, b")
    assert got.to_dict("records") == [{"a": 1, "b": 2}] * 2


# ------------------------------------------------------- negation/distinct

def test_not_exists(spark, diamond):
    q = "MATCH (a:N) WHERE NOT EXISTS { (a)-[:R]->(x) } RETURN a"
    got = run_batch(spark, diamond, q)
    assert got.to_dict("records") == [{"a": 3}]  # 3 only has S out... wait, 3 -[S]-> 4


def test_distinct(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b) RETURN DISTINCT a")
    assert sorted(got["a"]) == [1, 2]


def test_bag_keeps_duplicates(spark, diamond):
    got = run_batch(spark, diamond, "MATCH (a)-[:R]->(b) RETURN a")
    assert sorted(got["a"]) == [1, 1, 2]


# ------------------------------------------------------------------ unwind

def test_unwind_path_nodes(spark, diamond):
    q = "MATCH t = (a)-[:R*2..2]->(b) UNWIND nodes(t) AS n RETURN n"
    got = run_batch(spark, diamond, q)
    assert sorted(got["n"]) == [1, 2, 4]


def test_unwind_then_property(spark, diamond):
    q = "MATCH t = (a)-[:R*2..2]->(b) UNWIND nodes(t) AS n RETURN n.name AS nm"
    got = run_batch(spark, diamond, q)
    assert sorted(got["nm"]) == ["a", "b", "d"]


# ------------------------------------------------------------ alldifferent

def test_alldifferent_excludes_same_edge_twice(spark):
    # a⇄b with single edge pair; pattern (x)-[:R]->(y)-[:R]->(z) must not
    # reuse one edge for both hops
    g = graph_of(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
        [{"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}}],
    )
    got = run_batch(spark, g, "MATCH (x)-[:R]->(y)-[:R]->(z) RETURN x, y, z")
    assert got.empty


def test_alldifferent_path_vs_edge(spark):
    # path over e10 then an extra hop must not reuse e10
    g = graph_of(
        [{"id": i, "label": "N", "properties": {}} for i in (1, 2)],
        [
            {"id": 10, "src": 1, "dst": 2, "type": "R", "properties": {}},
            {"id": 11, "src": 2, "dst": 1, "type": "R", "properties": {}},
        ],
    )
    q = "MATCH t = (a)-[:R*]->(b), (b)-[:R]->(c) RETURN a, b, c"
    got = run_batch(spark, g, q)
    sql = (
        TRAIL_CTE.format(type="R")
        + "SELECT p.root AS a, p.cur AS b, e.dst AS c FROM paths p "
        "JOIN edges e ON e.src = p.cur AND e.type='R' AND NOT list_contains(p.es, e.id)"
    )
    assert_bag_equal(got, oracle_query(g, sql))


# ------------------------------------------------------- pushdown baseline

def test_baseline_mode_same_results(spark, diamond):
    q = "MATCH (a)-[:R]->(b) WHERE a.v = '1' RETURN a, b, b.name AS nm"
    on = run_batch(spark, diamond, q, pushdown=True)
    off = run_batch(spark, diamond, q, pushdown=False)
    assert_bag_equal(on, off)


def test_baseline_transitive_same_results(spark, diamond):
    q = "MATCH t = (a)-[:R*]->(b) WHERE b.name = 'd' RETURN a, b, t"
    on = path_col_to_str(run_batch(spark, diamond, q, pushdown=True), "t__vs", "t")
    off = path_col_to_str(run_batch(spark, diamond, q, pushdown=False), "t__vs", "t")
    assert_bag_equal(on.drop(columns=["t__es"]), off.drop(columns=["t__es"]))
