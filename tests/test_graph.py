"""PropertyGraph substrate tests: transactions, deltas, cascades, rollback."""
import pytest

from repro.graph import transactions as tx
from repro.graph.generators import example_graph
from repro.graph.property_graph import GraphConstraintError, PropertyGraph


def fresh():
    g = PropertyGraph()
    g.apply(tx.Transaction([tx.AddVertex(1, "A"), tx.AddVertex(2, "B")]))
    return g


# ------------------------------------------------------------------- basics

def test_empty_graph():
    g = PropertyGraph()
    assert g.num_vertices == 0 and g.num_edges == 0


def test_add_vertex():
    g = PropertyGraph()
    d = g.apply(tx.single(tx.AddVertex(1, "Post", {"lang": "en"})))
    assert g.num_vertices == 1
    assert d.v_inserts == [{"id": 1, "label": "Post", "properties": {"lang": "en"}}]
    assert not d.v_deletes and not d.e_inserts


def test_add_edge():
    g = fresh()
    d = g.apply(tx.single(tx.AddEdge(10, 1, 2, "R")))
    assert g.num_edges == 1
    assert d.e_inserts[0]["src"] == 1 and d.e_inserts[0]["type"] == "R"


def test_vertex_accessor_copies():
    g = fresh()
    v = g.vertex(1)
    v["properties"]["x"] = "mutated"
    assert "x" not in g.vertex(1)["properties"]


def test_fresh_id_unused():
    g = fresh()
    i = g.fresh_id()
    assert not g.has_vertex(i) and not g.has_edge(i)


# -------------------------------------------------------------- constraints

def test_duplicate_vertex_id_rejected():
    g = fresh()
    with pytest.raises(GraphConstraintError, match="duplicate"):
        g.apply(tx.single(tx.AddVertex(1, "A")))


def test_duplicate_edge_id_rejected():
    g = fresh()
    g.apply(tx.single(tx.AddEdge(10, 1, 2, "R")))
    with pytest.raises(GraphConstraintError, match="duplicate"):
        g.apply(tx.single(tx.AddEdge(10, 2, 1, "R")))


def test_edge_and_vertex_share_id_space():
    g = fresh()
    with pytest.raises(GraphConstraintError, match="duplicate"):
        g.apply(tx.single(tx.AddEdge(1, 1, 2, "R")))


def test_dangling_edge_rejected():
    g = fresh()
    with pytest.raises(GraphConstraintError, match="missing vertex"):
        g.apply(tx.single(tx.AddEdge(10, 1, 99, "R")))


def test_delete_missing_vertex_rejected():
    g = fresh()
    with pytest.raises(GraphConstraintError):
        g.apply(tx.single(tx.DeleteVertex(99)))


def test_delete_missing_edge_rejected():
    g = fresh()
    with pytest.raises(GraphConstraintError):
        g.apply(tx.single(tx.DeleteEdge(99)))


def test_set_property_on_missing_rejected():
    g = fresh()
    with pytest.raises(GraphConstraintError):
        g.apply(tx.single(tx.SetProperty("vertex", 99, "k", "v")))


def test_failed_transaction_rolls_back():
    g = fresh()
    with pytest.raises(GraphConstraintError):
        g.apply(
            tx.Transaction(
                [tx.AddVertex(3, "C"), tx.AddEdge(10, 3, 99, "R")]  # 2nd op fails
            )
        )
    assert not g.has_vertex(3)
    assert g.num_vertices == 2 and g.num_edges == 0


# ----------------------------------------------------------------- cascades

def test_vertex_delete_cascades_edges():
    g = fresh()
    g.apply(tx.Transaction([tx.AddEdge(10, 1, 2, "R"), tx.AddEdge(11, 2, 1, "S")]))
    d = g.apply(tx.single(tx.DeleteVertex(1)))
    assert g.num_edges == 0
    assert {e["id"] for e in d.e_deletes} == {10, 11}
    assert [v["id"] for v in d.v_deletes] == [1]


def test_self_loop_cascade():
    g = fresh()
    g.apply(tx.single(tx.AddEdge(10, 1, 1, "R")))
    d = g.apply(tx.single(tx.DeleteVertex(1)))
    assert {e["id"] for e in d.e_deletes} == {10}


# --------------------------------------------------------------- properties

def test_set_property_delta_is_delete_plus_insert():
    g = fresh()
    d = g.apply(tx.single(tx.SetProperty("vertex", 1, "k", "v")))
    assert d.v_deletes[0]["properties"] == {}
    assert d.v_inserts[0]["properties"] == {"k": "v"}


def test_set_property_same_value_is_noop_delta():
    g = fresh()
    g.apply(tx.single(tx.SetProperty("vertex", 1, "k", "v")))
    d = g.apply(tx.single(tx.SetProperty("vertex", 1, "k", "v")))
    assert d.is_empty()


def test_remove_property():
    g = fresh()
    g.apply(tx.single(tx.SetProperty("vertex", 1, "k", "v")))
    d = g.apply(tx.single(tx.RemoveProperty("vertex", 1, "k")))
    assert d.v_inserts[0]["properties"] == {}


def test_remove_missing_property_is_noop():
    g = fresh()
    d = g.apply(tx.single(tx.RemoveProperty("vertex", 1, "nope")))
    assert d.is_empty()


def test_edge_property_update():
    g = fresh()
    g.apply(tx.single(tx.AddEdge(10, 1, 2, "R")))
    d = g.apply(tx.single(tx.SetProperty("edge", 10, "w", "5")))
    assert d.e_inserts[0]["properties"] == {"w": "5"}
    assert not d.v_inserts and not d.v_deletes


# ------------------------------------------------------------------ netting

def test_add_then_delete_same_txn_nets_to_nothing():
    g = fresh()
    d = g.apply(tx.Transaction([tx.AddVertex(3, "C"), tx.DeleteVertex(3)]))
    assert d.is_empty()
    assert not g.has_vertex(3)


def test_delete_then_readd_same_content_nets_to_nothing():
    g = fresh()
    g.apply(tx.single(tx.AddEdge(10, 1, 2, "R")))
    d = g.apply(tx.Transaction([tx.DeleteEdge(10), tx.AddEdge(10, 1, 2, "R")]))
    assert d.is_empty()


def test_two_property_sets_net_to_final():
    g = fresh()
    d = g.apply(
        tx.Transaction(
            [tx.SetProperty("vertex", 1, "k", "a"), tx.SetProperty("vertex", 1, "k", "b")]
        )
    )
    assert d.v_inserts[0]["properties"] == {"k": "b"}
    assert len(d.v_inserts) == 1 and len(d.v_deletes) == 1


def test_delta_size():
    g = fresh()
    d = g.apply(tx.Transaction([tx.AddVertex(3, "C"), tx.AddEdge(10, 1, 3, "R")]))
    assert d.size() == 2


# ------------------------------------------------------------------ exports

def test_pandas_exports():
    g = example_graph()
    v = g.vertices_pandas()
    e = g.edges_pandas()
    assert len(v) == 5 and len(e) == 3
    assert set(v.columns) == {"id", "label", "properties"}
    assert set(e.columns) == {"id", "src", "dst", "type", "properties"}


def test_flat_pandas_props():
    g = example_graph()
    v, e = g.flat_pandas("lang")
    assert "p_lang" in v.columns
    assert v.set_index("id").loc[1, "p_lang"] == "en"
    assert v.set_index("id").loc[4, "p_lang"] == "de"


def test_from_rows_validates():
    with pytest.raises(GraphConstraintError):
        PropertyGraph.from_rows(
            [{"id": 1, "label": "A"}], [{"id": 2, "src": 1, "dst": 9, "type": "R"}]
        )
