"""Physical schema mapping tests (attr kinds / fields; no Spark needed)."""
import pytest

from repro.algebra import nra
from repro.core.session import compile_to_fra
from repro.fra.eval_spark import attr_kinds, physical_fields, physical_schema, _join_keys


def test_kinds_running_example():
    plan = compile_to_fra(
        "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"
    )
    assert attr_kinds(plan) == {"p": "var", "t": "path"}


def test_fields_running_example():
    plan = compile_to_fra(
        "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"
    )
    assert physical_fields(plan) == [("p", "long"), ("t__vs", "array"), ("t__es", "array")]


def test_fields_property_alias_is_string():
    plan = compile_to_fra("MATCH (n:Post) RETURN n, n.lang AS l")
    assert physical_fields(plan) == [("n", "long"), ("l", "string")]


def test_fields_edge_var_is_long():
    plan = compile_to_fra("MATCH (a)-[e:R]->(b) RETURN e")
    assert physical_fields(plan) == [("e", "long")]


def test_fields_props_map_in_baseline():
    plan = compile_to_fra("MATCH (n:Post) WHERE n.lang = 'en' RETURN n", pushdown=False)
    kinds = {}
    for node in nra.walk(plan):
        if isinstance(node, nra.GetVertices):
            kinds = attr_kinds(node)
    assert kinds["n__props"] == "props"


def test_physical_schema_order_matches_logical():
    plan = compile_to_fra("MATCH t = (a:Post)-[:REPLY*]->(b) RETURN a, t, b")
    assert physical_schema(plan) == ["a", "t__vs", "t__es", "b"]


def test_join_keys_exclude_paths_and_props():
    plan = compile_to_fra(
        "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"
    )
    joins = [n for n in nra.walk(plan) if isinstance(n, nra.NaturalJoin)]
    top = joins[0]
    assert _join_keys(top.left, top.right) == ["c"]


def test_unwind_out_var_is_long():
    plan = compile_to_fra("MATCH t = (a)-[:R*]->(b) UNWIND nodes(t) AS n RETURN n")
    assert physical_fields(plan) == [("n", "long")]
