"""Synthetic graph generator tests: determinism, shape, fault seeding."""
import numpy as np
import pytest

from repro.graph.generators import (
    RailwaySpec,
    SnbSpec,
    example_graph,
    railway_lite,
    snb_lite,
)


# ------------------------------------------------------------ example graph

def test_example_graph_shape():
    g = example_graph()
    assert g.num_vertices == 5 and g.num_edges == 3


def test_example_graph_labels():
    g = example_graph()
    assert g.vertex(1)["label"] == "Post"
    assert g.vertex(2)["label"] == "Comm"
    assert g.vertex(1)["properties"]["lang"] == "en"


# ---------------------------------------------------------------- snb_lite

def test_snb_deterministic():
    a, b = snb_lite(SnbSpec(seed=7)), snb_lite(SnbSpec(seed=7))
    assert a.vertices_pandas().equals(b.vertices_pandas())
    assert a.edges_pandas().equals(b.edges_pandas())


def test_snb_seed_changes_graph():
    a, b = snb_lite(SnbSpec(seed=1)), snb_lite(SnbSpec(seed=2))
    assert not a.edges_pandas().equals(b.edges_pandas())


def test_snb_labels_present():
    g = snb_lite(SnbSpec(n_persons=10, n_posts=5, seed=0))
    labels = set(g.vertices_pandas()["label"])
    assert labels == {"Person", "Post", "Comm"}


def test_snb_edge_types():
    g = snb_lite(SnbSpec(seed=0))
    types = set(g.edges_pandas()["type"])
    assert types <= {"KNOWS", "LIKES", "REPLY"}
    assert "REPLY" in types and "KNOWS" in types


def test_snb_reply_is_forest():
    """Every message has at most one REPLY parent edge (reply trees)."""
    g = snb_lite(SnbSpec(seed=3))
    e = g.edges_pandas()
    replies = e[e["type"] == "REPLY"]
    assert replies["dst"].is_unique


def test_snb_reply_depth_bounded():
    spec = SnbSpec(max_reply_depth=3, seed=5)
    g = snb_lite(spec)
    e = g.edges_pandas()
    replies = e[e["type"] == "REPLY"]
    parent = dict(zip(replies["dst"], replies["src"]))
    for m in parent:
        depth, cur = 0, m
        while cur in parent:
            cur = parent[cur]
            depth += 1
            assert depth <= spec.max_reply_depth


def test_snb_no_knows_self_loop():
    g = snb_lite(SnbSpec(seed=0))
    e = g.edges_pandas()
    knows = e[e["type"] == "KNOWS"]
    assert (knows["src"] != knows["dst"]).all()


def test_snb_comment_lang_mostly_matches_post():
    g = snb_lite(SnbSpec(n_posts=40, comments_per_post=6, seed=0))
    v = g.vertices_pandas().set_index("id")
    e = g.edges_pandas()
    replies = e[e["type"] == "REPLY"]
    # walk each comment to its root post
    parent = dict(zip(replies["dst"], replies["src"]))
    match = total = 0
    for c in v[v["label"] == "Comm"].index:
        cur = c
        while cur in parent:
            cur = parent[cur]
        if v.loc[cur, "label"] == "Post":
            total += 1
            if v.loc[cur, "properties"].get("lang") == v.loc[c, "properties"].get("lang"):
                match += 1
    assert total > 0 and match / total > 0.6


def test_snb_scales():
    small = snb_lite(SnbSpec(n_persons=5, n_posts=3, seed=0))
    big = snb_lite(SnbSpec(n_persons=50, n_posts=30, seed=0))
    assert big.num_vertices > small.num_vertices * 3


# ------------------------------------------------------------- railway_lite

def test_railway_deterministic():
    a, b = railway_lite(RailwaySpec(seed=4)), railway_lite(RailwaySpec(seed=4))
    assert a.vertices_pandas().equals(b.vertices_pandas())
    assert a.edges_pandas().equals(b.edges_pandas())


def test_railway_labels():
    g = railway_lite(RailwaySpec(seed=0))
    labels = set(g.vertices_pandas()["label"])
    assert labels == {"Route", "Semaphore", "SwitchPosition", "Switch", "Sensor", "Segment"}


def test_railway_edge_types():
    g = railway_lite(RailwaySpec(seed=0))
    types = set(g.edges_pandas()["type"])
    assert types == {"entry", "follows", "target", "monitoredBy", "requires", "connectsTo"}


def test_railway_counts_scale_with_routes():
    spec = RailwaySpec(n_routes=4, switches_per_route=2, segments_per_sensor=3, seed=0)
    g = railway_lite(spec)
    v = g.vertices_pandas()
    assert (v["label"] == "Route").sum() == 4
    assert (v["label"] == "Switch").sum() == 8
    assert (v["label"] == "Segment").sum() == 24


def test_railway_poslength_faults_seeded():
    g = railway_lite(RailwaySpec(n_routes=20, fault_rate=0.3, seed=1))
    v = g.vertices_pandas()
    segs = v[v["label"] == "Segment"]
    bad = sum(1 for p in segs["properties"] if int(p["length"]) <= 0)
    assert 0 < bad < len(segs)


def test_railway_routesensor_faults_seeded():
    g = railway_lite(RailwaySpec(n_routes=20, fault_rate=0.3, seed=1))
    e = g.edges_pandas()
    n_switches = (g.vertices_pandas()["label"] == "Switch").sum()
    n_requires = (e["type"] == "requires").sum()
    assert 0 < n_requires < n_switches


def test_railway_zero_faults():
    g = railway_lite(RailwaySpec(n_routes=10, fault_rate=0.0, seed=2))
    v = g.vertices_pandas()
    segs = v[v["label"] == "Segment"]
    assert all(int(p["length"]) > 0 for p in segs["properties"])
