"""GRA → NRA rewrite tests (paper §4 step 2)."""
import math

from repro.algebra import expr as ex
from repro.algebra import gra, nra
from repro.algebra.rewrite import to_nra
from repro.cypher.compile import compile_cypher


def find(tree, cls):
    return [n for n in nra.walk(tree) if isinstance(n, cls)]


def nra_of(q):
    return to_nra(compile_cypher(q))


def test_no_expand_survives():
    t = nra_of("MATCH (a:X)-[:R]->(b:Y)-[:S]->(c) RETURN a")
    # ExpandOut is a GRA class; the NRA tree must contain only NRA nodes.
    for n in nra.walk(t):
        assert not isinstance(n, gra.ExpandOut)


def test_expand_becomes_join_with_get_edges():
    t = nra_of("MATCH (a:X)-[:R]->(b) RETURN a, b")
    (ge,) = find(t, nra.GetEdges)
    assert ge.src_var == "a" and ge.dst_var == "b" and ge.edge_type == "R"
    assert find(t, nra.NaturalJoin)


def test_label_becomes_extra_vertex_scan():
    t = nra_of("MATCH (a:X)-[:R]->(b:Y) RETURN a, b")
    scans = find(t, nra.GetVertices)
    assert {(s.var, s.label) for s in scans} == {("a", "X"), ("b", "Y")}


def test_unlabelled_target_no_extra_scan():
    t = nra_of("MATCH (a:X)-[:R]->(b) RETURN a, b")
    scans = find(t, nra.GetVertices)
    assert {(s.var, s.label) for s in scans} == {("a", "X")}


def test_transitive_becomes_transitive_join():
    t = nra_of("MATCH t = (a:X)-[:R*2..4]->(b:Y) RETURN t")
    (tj,) = find(t, nra.TransitiveJoin)
    assert tj.src_attr == "a" and tj.dst_var == "b" and tj.path_var == "t"
    assert tj.min_hops == 2 and tj.max_hops == 4


def test_direction_preserved():
    t = nra_of("MATCH (a)<-[:R]-(b) RETURN a")
    (ge,) = find(t, nra.GetEdges)
    assert ge.direction == "in"


def test_property_reads_become_unnest():
    t = nra_of("MATCH (a:X) WHERE a.lang = 'en' RETURN a")
    (u,) = find(t, nra.Unnest)
    assert u.items == (("a", "lang", "a__lang"),)
    (s,) = find(t, nra.Selection)
    assert s.predicate == ex.Cmp("=", ex.Attr("a__lang"), ex.Lit("en"))


def test_unnest_shared_between_selection_and_projection():
    t = nra_of("MATCH (a:X) WHERE a.lang = 'en' RETURN a.lang AS l")
    unnests = find(t, nra.Unnest)
    # the projection reuses the attribute unnested for the selection
    all_items = [i for u in unnests for i in u.items]
    assert all_items.count(("a", "lang", "a__lang")) == 1


def test_two_properties_one_unnest():
    t = nra_of("MATCH (a:X)-[:R]->(b:Y) WHERE a.lang = b.lang RETURN a")
    (u,) = find(t, nra.Unnest)
    assert set(u.items) == {("a", "lang", "a__lang"), ("b", "lang", "b__lang")}


def test_running_example_shape():
    t = nra_of("MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t")
    assert isinstance(t, nra.Projection)
    assert isinstance(t.child, nra.Selection)
    assert isinstance(t.child.child, nra.Unnest)
    (tj,) = find(t, nra.TransitiveJoin)
    assert tj.edge_type == "REPLY" and tj.max_hops == math.inf


def test_antijoin_passthrough():
    t = nra_of("MATCH (r:Route)-[:f]->(s) WHERE NOT EXISTS { (r)-[:q]->(x) } RETURN r")
    assert find(t, nra.AntiJoin)


def test_distinct_passthrough():
    t = nra_of("MATCH (a) RETURN DISTINCT a")
    assert isinstance(t, nra.Distinct)


def test_unwind_passthrough():
    t = nra_of("MATCH t = (a)-[:R*]->(b) UNWIND nodes(t) AS n RETURN n")
    assert find(t, nra.UnwindPath)


def test_schema_preserved_by_rewrite():
    q = "MATCH (a:X)-[:R]->(b:Y) WHERE a.lang = b.lang RETURN a, b"
    g = compile_cypher(q)
    assert nra.schema(to_nra(g)) == gra.schema(g) == ["a", "b"]


def test_edge_var_preserved():
    t = nra_of("MATCH (a)-[e:R]->(b) RETURN e")
    (ge,) = find(t, nra.GetEdges)
    assert ge.edge_var == "e"
