"""Parser unit tests: accepted fragment + rejected constructs."""
import math

import pytest

from repro.algebra import expr as ex
from repro.cypher import ast
from repro.cypher.lexer import CypherSyntaxError
from repro.cypher.parser import parse


# ------------------------------------------------------------------ accepted

def test_minimal_query():
    q = parse("MATCH (n) RETURN n")
    assert len(q.patterns) == 1
    assert q.patterns[0].nodes[0] == ast.NodePattern("n", None)
    assert q.items == (ast.ReturnItem(ex.Attr("n"), "n"),)


def test_label():
    q = parse("MATCH (p:Post) RETURN p")
    assert q.patterns[0].nodes[0] == ast.NodePattern("p", "Post")


def test_anonymous_node():
    q = parse("MATCH (a)-[:T]->() RETURN a")
    assert q.patterns[0].nodes[1] == ast.NodePattern(None, None)


def test_relationship_out():
    q = parse("MATCH (a)-[:KNOWS]->(b) RETURN a")
    r = q.patterns[0].rels[0]
    assert r.edge_type == "KNOWS" and r.direction == "out" and r.min_hops == 1 and r.max_hops == 1


def test_relationship_in():
    q = parse("MATCH (a)<-[:KNOWS]-(b) RETURN a")
    assert q.patterns[0].rels[0].direction == "in"


def test_edge_variable():
    q = parse("MATCH (a)-[e:LIKES]->(b) RETURN a")
    assert q.patterns[0].rels[0].var == "e"


def test_untyped_relationship():
    q = parse("MATCH (a)-[]->(b) RETURN a")
    assert q.patterns[0].rels[0].edge_type is None


def test_star_unbounded():
    r = parse("MATCH (a)-[:R*]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 1 and r.max_hops == math.inf


def test_star_exact():
    r = parse("MATCH (a)-[:R*3]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 3 and r.max_hops == 3


def test_star_range():
    r = parse("MATCH (a)-[:R*2..5]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 2 and r.max_hops == 5


def test_star_open_upper():
    r = parse("MATCH (a)-[:R*2..]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 2 and r.max_hops == math.inf


def test_star_zero():
    r = parse("MATCH (a)-[:R*0..2]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 0 and r.max_hops == 2


def test_star_leading_dots():
    r = parse("MATCH (a)-[:R*..4]->(b) RETURN a").patterns[0].rels[0]
    assert r.min_hops == 1 and r.max_hops == 4


def test_named_path():
    q = parse("MATCH t = (a)-[:R*]->(b) RETURN t")
    assert q.patterns[0].path_var == "t"


def test_multiple_patterns():
    q = parse("MATCH (a)-[:X]->(b), (a)-[:Y]->(c) RETURN a")
    assert len(q.patterns) == 2


def test_long_chain():
    q = parse("MATCH (a)-[:X]->(b)-[:Y]->(c)-[:Z]->(d) RETURN a")
    assert len(q.patterns[0].nodes) == 4 and len(q.patterns[0].rels) == 3


def test_where_eq():
    q = parse("MATCH (a) WHERE a.name = 'bob' RETURN a")
    assert q.where.predicates == (ex.Cmp("=", ex.PropAccess("a", "name"), ex.Lit("bob")),)


def test_where_numeric():
    q = parse("MATCH (s:Segment) WHERE s.length <= 0 RETURN s")
    assert q.where.predicates == (ex.Cmp("<=", ex.PropAccess("s", "length"), ex.Lit(0)),)


def test_where_negative_literal():
    q = parse("MATCH (s) WHERE s.x > -5 RETURN s")
    assert q.where.predicates == (ex.Cmp(">", ex.PropAccess("s", "x"), ex.Lit(-5)),)


def test_where_float_literal():
    q = parse("MATCH (s) WHERE s.x < 2.5 RETURN s")
    assert q.where.predicates[0].right == ex.Lit(2.5)


def test_where_prop_vs_prop():
    q = parse("MATCH (a)-[:R]->(b) WHERE a.lang = b.lang RETURN a")
    assert q.where.predicates == (
        ex.Cmp("=", ex.PropAccess("a", "lang"), ex.PropAccess("b", "lang")),
    )


def test_where_and_kept_as_conjunction():
    # AND is associative: one And expression or two conjuncts are equivalent.
    q = parse("MATCH (a) WHERE a.x = 1 AND a.y = 2 RETURN a")
    assert len(q.where.predicates) == 1
    assert isinstance(q.where.predicates[0], ex.And)


def test_where_or_stays_single_conjunct():
    q = parse("MATCH (a) WHERE a.x = 1 OR a.y = 2 RETURN a")
    assert len(q.where.predicates) == 1
    assert isinstance(q.where.predicates[0], ex.Or)


def test_where_parenthesized():
    q = parse("MATCH (a) WHERE (a.x = 1 AND a.y = 2) OR a.z = 3 RETURN a")
    assert isinstance(q.where.predicates[0], ex.Or)
    assert isinstance(q.where.predicates[0].left, ex.And)


def test_where_not():
    q = parse("MATCH (a) WHERE NOT a.x = 1 RETURN a")
    assert isinstance(q.where.predicates[0], ex.Not)


def test_not_exists():
    q = parse("MATCH (r:Route) WHERE NOT EXISTS { (r)-[:requires]->(s:Sensor) } RETURN r")
    assert len(q.where.not_exists) == 1
    assert q.where.not_exists[0].patterns[0].nodes[1].label == "Sensor"


def test_not_exists_mixed_with_predicate():
    q = parse(
        "MATCH (r)-[:a]->(x) WHERE r.v = 1 AND NOT EXISTS { (r)-[:b]->(y) } AND x.w = 2 RETURN r"
    )
    assert len(q.where.predicates) == 2 and len(q.where.not_exists) == 1


def test_unwind():
    q = parse("MATCH t = (a)-[:R*]->(b) UNWIND nodes(t) AS n RETURN n")
    assert q.unwind == ast.Unwind("t", "n")


def test_return_distinct():
    assert parse("MATCH (a) RETURN DISTINCT a").distinct


def test_return_property_default_alias():
    q = parse("MATCH (a) RETURN a.name")
    assert q.items[0] == ast.ReturnItem(ex.PropAccess("a", "name"), "a_name")


def test_return_alias():
    q = parse("MATCH (a) RETURN a.name AS x")
    assert q.items[0].alias == "x"


def test_return_multiple_items():
    q = parse("MATCH (a)-[:R]->(b) RETURN a, b, a.x AS ax")
    assert [it.alias for it in q.items] == ["a", "b", "ax"]


# ------------------------------------------------------------------ rejected

@pytest.mark.parametrize(
    "query,reason",
    [
        ("MATCH (a) RETURN a ORDER BY a", "ORDER"),
        ("MATCH (a) RETURN a SKIP 5", "SKIP"),
        ("MATCH (a) RETURN a LIMIT 3", "LIMIT"),
        ("OPTIONAL MATCH (a) RETURN a", "OPTIONAL"),
        ("MATCH (a) WITH a RETURN a", "WITH"),
        ("CREATE (a) RETURN a", "CREATE"),
    ],
)
def test_out_of_fragment_keywords(query, reason):
    with pytest.raises(ast.UnsupportedCypherError, match=reason):
        parse(query)


def test_aggregation_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="aggregation"):
        parse("MATCH (a) RETURN count(a)")


def test_aggregation_in_where_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="aggregation"):
        parse("MATCH (a) WHERE count(a) > 1 RETURN a")


def test_list_literal_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="list literal"):
        parse("MATCH (a) WHERE a.x = [1, 2] RETURN a")


def test_undirected_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="undirected"):
        parse("MATCH (a)-[:R]-(b) RETURN a")


def test_var_length_list_binding_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="list variable"):
        parse("MATCH (a)-[es:R*]->(b) RETURN a")


def test_bare_exists_rejected():
    with pytest.raises(ast.UnsupportedCypherError, match="NOT EXISTS"):
        parse("MATCH (a) WHERE EXISTS { (a)-[:R]->(b) } RETURN a")


# ---------------------------------------------------------------- bad syntax

@pytest.mark.parametrize(
    "query",
    [
        "MATCH (a RETURN a",
        "MATCH (a) RETURN",
        "RETURN a",
        "MATCH (a) WHERE RETURN a",
        "MATCH (a)->(b) RETURN a",
        "MATCH (a) WHERE a.x == 1 RETURN a",
        "MATCH (a) RETURN a extra",
        "MATCH (a)-[:R*5..2]->(b) RETURN a",
    ],
)
def test_syntax_errors(query):
    with pytest.raises((CypherSyntaxError, ast.UnsupportedCypherError)):
        parse(query)
