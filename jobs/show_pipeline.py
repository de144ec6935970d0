"""Print the three compilation stages (§4) for the paper's running example.

Usage: ``python jobs/show_pipeline.py ["<cypher query>"]``.
No Spark needed — this is the pure compilation pipeline.
"""
import sys

from repro.algebra import pretty, rewrite, schema_inference
from repro.cypher.compile import compile_cypher

RUNNING_EXAMPLE = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"


def main() -> None:
    query = sys.argv[1] if len(sys.argv) > 1 else RUNNING_EXAMPLE
    print(f"Query:\n  {query}\n")
    g = compile_cypher(query)
    print("(1) GRA — openCypher compiled to graph relational algebra:")
    print(pretty.gra_str(g, 1) + "\n")
    n = rewrite.to_nra(g)
    print("(2) NRA — expands replaced by (transitive) joins with get-edges, "
          "property reads as explicit unnest:")
    print(pretty.nra_str(n, 1) + "\n")
    f = schema_inference.infer(n)
    print("(3) FRA — minimal schema inferred, properties pushed to the scans:")
    print(pretty.nra_str(f, 1))


if __name__ == "__main__":
    main()
