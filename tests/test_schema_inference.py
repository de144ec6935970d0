"""NRA → FRA minimal-schema inference tests (paper §4 step 3)."""
import pytest

from repro.algebra import nra
from repro.algebra.rewrite import to_nra
from repro.algebra.schema_inference import assert_flat, infer, prepare
from repro.cypher.compile import compile_cypher


def fra_of(q, pushdown=True):
    return prepare(to_nra(compile_cypher(q)), pushdown=pushdown)


def find(tree, cls):
    return [n for n in nra.walk(tree) if isinstance(n, cls)]


def test_no_unnest_after_inference():
    t = fra_of("MATCH (a:X) WHERE a.lang = 'en' RETURN a.lang AS l")
    assert_flat(t)
    assert not find(t, nra.Unnest)


def test_property_pushed_to_vertex_scan():
    t = fra_of("MATCH (a:X) WHERE a.lang = 'en' RETURN a")
    (scan,) = find(t, nra.GetVertices)
    assert scan.props == {"lang": "a__lang"}
    assert not scan.include_properties


def test_running_example_minimal_schema():
    # π σ (○(p:Post{lang→p__lang}) ⋈* …) ⋈ ○(c:Comm{lang→c__lang}) — §4 (3)
    t = fra_of("MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t")
    scans = {s.var: s for s in find(t, nra.GetVertices)}
    assert scans["p"].props == {"lang": "p__lang"}
    assert scans["c"].props == {"lang": "c__lang"}


def test_multiple_props_merge_on_one_scan():
    t = fra_of("MATCH (a:X) WHERE a.p = '1' AND a.q = '2' RETURN a.r AS r")
    (scan,) = find(t, nra.GetVertices)
    assert scan.props == {"p": "a__p", "q": "a__q", "r": "a__r"}


def test_edge_property_pushed_to_get_edges():
    t = fra_of("MATCH (a)-[e:R]->(b) WHERE e.weight = '3' RETURN a")
    (ge,) = find(t, nra.GetEdges)
    assert ge.props == {"weight": "e__weight"}


def test_residual_var_gets_fresh_scan():
    # b is bound by GetEdges (unlabelled target): its property needs a
    # fresh unlabelled ○ scan joined in.
    t = fra_of("MATCH (a:X)-[:R]->(b) WHERE b.lang = 'en' RETURN a")
    scans = {s.var: s for s in find(t, nra.GetVertices)}
    assert scans["b"].label is None
    assert scans["b"].props == {"lang": "b__lang"}


def test_transitive_dst_residual_scan():
    t = fra_of("MATCH (a:X)-[:R*]->(b) WHERE b.kind = 'k' RETURN a")
    scans = {s.var: s for s in find(t, nra.GetVertices)}
    assert "b" in scans and scans["b"].props == {"kind": "b__kind"}


def test_unwind_output_residual_scan():
    t = fra_of(
        "MATCH t = (a:X)-[:R*]->(b) UNWIND nodes(t) AS n RETURN n.name AS nm"
    )
    scans = {s.var: s for s in find(t, nra.GetVertices)}
    assert "n" in scans and scans["n"].props == {"name": "n__name"}


def test_schema_unchanged_by_inference():
    q = "MATCH (a:X)-[:R]->(b:Y) WHERE a.lang = b.lang RETURN a, b"
    n = to_nra(compile_cypher(q))
    assert nra.schema(infer(n)) == nra.schema(n)


def test_no_props_no_change():
    t = fra_of("MATCH (a:X)-[:R]->(b:Y) RETURN a, b")
    for s in find(t, nra.GetVertices):
        assert s.props == {} and not s.include_properties


# --------------------------------------------------- no-pushdown baseline

def test_baseline_keeps_unnest():
    t = fra_of("MATCH (a:X) WHERE a.lang = 'en' RETURN a", pushdown=False)
    assert find(t, nra.Unnest)
    with pytest.raises(AssertionError):
        assert_flat(t)


def test_baseline_leaves_ship_all_properties():
    t = fra_of("MATCH (a:X)-[e:R]->(b:Y) RETURN a", pushdown=False)
    for s in find(t, nra.GetVertices):
        assert s.include_properties and s.props == {}
    for g in find(t, nra.GetEdges):
        assert g.include_properties


def test_baseline_residual_var_scan_ships_props():
    t = fra_of("MATCH (a:X)-[:R*]->(b) WHERE b.kind = 'k' RETURN a", pushdown=False)
    scans = {s.var: s for s in find(t, nra.GetVertices)}
    assert scans["b"].include_properties


def test_baseline_schema_superset():
    q = "MATCH (a:X) WHERE a.lang = 'en' RETURN a"
    on = set(nra.schema(fra_of(q)))
    off = set(nra.schema(fra_of(q, pushdown=False)))
    assert on == off  # Projection normalizes the final schema either way
