"""Pretty-printer structural golden tests (paper §4 pipeline stages)."""
from repro.algebra import pretty, rewrite, schema_inference
from repro.cypher.compile import compile_cypher

RUNNING_EXAMPLE = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"


def test_gra_running_example():
    s = pretty.gra_str(compile_cypher(RUNNING_EXAMPLE))
    assert s == (
        "Project[p AS p, t AS t]\n"
        "  Select[(c.lang = p.lang)]\n"
        "    Expand(p)->[:REPLY*1..](c:Comm) path=t\n"
        "      GetVertices(p:Post)"
    )


def test_nra_running_example():
    s = pretty.nra_str(rewrite.to_nra(compile_cypher(RUNNING_EXAMPLE)))
    assert s == (
        "Project[p AS p, t AS t]\n"
        "  Select[(c__lang = p__lang)]\n"
        "    Unnest[c.lang->c__lang, p.lang->p__lang]\n"
        "      Join\n"
        "        TransitiveJoin(p)->[:REPLY*1..](c) path=t\n"
        "          GetVertices(p:Post)\n"
        "        GetVertices(c:Comm)"
    )


def test_fra_running_example_minimal_schema():
    s = pretty.nra_str(schema_inference.infer(rewrite.to_nra(compile_cypher(RUNNING_EXAMPLE))))
    assert s == (
        "Project[p AS p, t AS t]\n"
        "  Select[(c__lang = p__lang)]\n"
        "    Join\n"
        "      TransitiveJoin(p)->[:REPLY*1..](c) path=t\n"
        "        GetVertices(p:Post){lang->p__lang}\n"
        "      GetVertices(c:Comm){lang->c__lang}"
    )


def test_fra_baseline_ships_whole_maps():
    plan = schema_inference.prepare(
        rewrite.to_nra(compile_cypher(RUNNING_EXAMPLE)), pushdown=False
    )
    s = pretty.nra_str(plan)
    assert "GetVertices(p:Post){*}" in s
    assert "Unnest" in s


def test_antijoin_render():
    q = "MATCH (r:Route)-[:follows]->(s) WHERE NOT EXISTS { (r)-[:requires]->(x:Sensor) } RETURN r"
    s = pretty.gra_str(compile_cypher(q))
    assert "AntiJoin" in s


def test_alldifferent_render():
    q = "MATCH (a)-[:X]->(b)-[:Y]->(c) RETURN a"
    s = pretty.gra_str(compile_cypher(q))
    assert "AllDifferent" in s
