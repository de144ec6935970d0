"""AST → GRA compilation tests."""
import pytest

from repro.algebra import expr as ex
from repro.algebra import gra
from repro.cypher import ast
from repro.cypher.compile import CypherCompileError, compile_cypher, to_gra
from repro.cypher.parser import parse


def find(tree, cls):
    out = []

    def rec(n):
        if isinstance(n, cls):
            out.append(n)
        for c in gra.children(n):
            rec(c)

    rec(tree)
    return out


def test_single_node():
    t = compile_cypher("MATCH (n:Post) RETURN n")
    assert isinstance(t, gra.Projection)
    assert find(t, gra.GetVertices) == [gra.GetVertices("n", "Post")]


def test_expand_chain():
    t = compile_cypher("MATCH (a:Person)-[:KNOWS]->(b:Person) RETURN a, b")
    (e,) = find(t, gra.ExpandOut)
    assert e.src_var == "a" and e.dst_var == "b" and e.edge_type == "KNOWS"
    assert e.dst_label == "Person" and not e.is_transitive


def test_expand_direction_in():
    t = compile_cypher("MATCH (a)<-[:R]-(b) RETURN a")
    (e,) = find(t, gra.ExpandOut)
    assert e.direction == "in"


def test_transitive_binds_path():
    t = compile_cypher("MATCH t = (a:Post)-[:REPLY*]->(c:Comm) RETURN t")
    (e,) = find(t, gra.ExpandOut)
    assert e.is_transitive and e.path_var == "t"


def test_anonymous_path_gets_fresh_var():
    t = compile_cypher("MATCH (a)-[:R*]->(b) RETURN a")
    (e,) = find(t, gra.ExpandOut)
    assert e.path_var.startswith("#p")


def test_anonymous_edge_gets_fresh_var():
    t = compile_cypher("MATCH (a)-[:R]->(b) RETURN a")
    (e,) = find(t, gra.ExpandOut)
    assert e.edge_var.startswith("#e")


def test_named_edge_var_kept():
    t = compile_cypher("MATCH (a)-[e:R]->(b) RETURN a, e")
    (x,) = find(t, gra.ExpandOut)
    assert x.edge_var == "e"


def test_alldifferent_added_for_two_edges():
    t = compile_cypher("MATCH (a)-[:X]->(b)-[:Y]->(c) RETURN a")
    (ad,) = find(t, gra.AllDifferent)
    assert len(ad.edge_vars) == 2 and not ad.path_vars


def test_alldifferent_covers_paths():
    t = compile_cypher("MATCH t = (a)-[:X*]->(b), (a)-[:Y]->(c) RETURN a")
    (ad,) = find(t, gra.AllDifferent)
    assert ad.path_vars == ("t",) and len(ad.edge_vars) == 1


def test_no_alldifferent_for_single_edge():
    t = compile_cypher("MATCH (a)-[:X]->(b) RETURN a")
    assert not find(t, gra.AllDifferent)


def test_multiple_parts_joined():
    t = compile_cypher("MATCH (a)-[:X]->(b), (c)-[:Y]->(b) RETURN a, c")
    assert find(t, gra.NaturalJoin)


def test_where_selection():
    t = compile_cypher("MATCH (a:Post) WHERE a.lang = 'en' RETURN a")
    (s,) = find(t, gra.Selection)
    assert s.predicate == ex.Cmp("=", ex.PropAccess("a", "lang"), ex.Lit("en"))


def test_not_exists_antijoin():
    t = compile_cypher(
        "MATCH (r:Route)-[:follows]->(s) WHERE NOT EXISTS { (r)-[:requires]->(x:Sensor) } RETURN r"
    )
    (aj,) = find(t, gra.AntiJoin)
    assert find(aj.right, gra.GetVertices)[0].var == "r"


def test_not_exists_fresh_vars_do_not_collide():
    """Regression: the subpattern's anonymous edge var must not shadow an
    outer one — a collision silently becomes a bogus anti-join key."""
    from repro.algebra import nra
    from repro.algebra.rewrite import to_nra
    from repro.fra.eval_spark import _join_keys

    t = to_nra(
        compile_cypher(
            "MATCH (r:Route)-[:follows]->(s)-[:target]->(w)-[:monitoredBy]->(sen:Sensor) "
            "WHERE NOT EXISTS { (r)-[:requires]->(sen) } RETURN r, sen"
        )
    )
    aj = [n for n in nra.walk(t) if isinstance(n, nra.AntiJoin)][0]
    assert _join_keys(aj.left, aj.right) == ["r", "sen"]


def test_uncorrelated_not_exists_rejected():
    with pytest.raises(CypherCompileError, match="shares no variable"):
        compile_cypher("MATCH (a:X) WHERE NOT EXISTS { (q:Y)-[:R]->(z) } RETURN a")


def test_distinct():
    t = compile_cypher("MATCH (a) RETURN DISTINCT a")
    assert isinstance(t, gra.Distinct)


def test_unwind():
    t = compile_cypher("MATCH t = (a)-[:R*]->(b) UNWIND nodes(t) AS n RETURN n")
    (u,) = find(t, gra.UnwindPath)
    assert u.path_var == "t" and u.out_var == "n"


def test_cyclic_pattern_gets_equality_filter():
    t = compile_cypher("MATCH (a)-[:X]->(b)-[:Y]->(a) RETURN a, b")
    sels = find(t, gra.Selection)
    assert any(
        isinstance(s.predicate, ex.Cmp)
        and s.predicate.op == "="
        and isinstance(s.predicate.left, ex.Attr)
        and isinstance(s.predicate.right, ex.Attr)
        and s.predicate.right.name == "a"
        for s in sels
    )


def test_schema_of_compiled_query():
    t = compile_cypher("MATCH (a:Person)-[:KNOWS]->(b) RETURN a, b")
    assert gra.schema(t) == ["a", "b"]


def test_return_unbound_variable_rejected():
    with pytest.raises(CypherCompileError, match="unbound"):
        compile_cypher("MATCH (a) RETURN b")


def test_where_unbound_variable_rejected():
    with pytest.raises(CypherCompileError, match="unbound"):
        compile_cypher("MATCH (a) WHERE b.x = 1 RETURN a")


def test_unwind_unbound_path_rejected():
    with pytest.raises(CypherCompileError, match="unbound path"):
        compile_cypher("MATCH (a)-[:R]->(b) UNWIND nodes(t) AS n RETURN n")


def test_duplicate_alias_rejected():
    with pytest.raises(CypherCompileError, match="duplicate"):
        compile_cypher("MATCH (a)-[:R]->(b) RETURN a AS x, b AS x")


def test_dunder_identifier_rejected():
    with pytest.raises(CypherCompileError, match="__"):
        compile_cypher("MATCH (a__b) RETURN a__b")


def test_named_path_on_plain_edge_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="named paths"):
        compile_cypher("MATCH t = (a)-[:R]->(b) RETURN t")


def test_projection_items_preserved():
    t = compile_cypher("MATCH (a:Post) RETURN a.lang AS l, a")
    assert isinstance(t, gra.Projection)
    assert t.items == ((ex.PropAccess("a", "lang"), "l"), (ex.Attr("a"), "a"))
