"""Randomized golden equivalence: incremental == recompute == DuckDB.

The strongest correctness check in the suite: random graphs, random
transaction streams, and after every transaction the incrementally
maintained view must equal a from-scratch FRA evaluation; at the end the
transitive query is additionally diffed against a DuckDB recursive-CTE
oracle.
"""
import numpy as np
import pytest

from repro.graph import transactions as tx
from repro.graph.property_graph import PropertyGraph

from tests.util import (
    TRAIL_CTE,
    assert_bag_equal,
    check_incremental_vs_recompute,
    oracle_query,
    path_col_to_str,
)

LABELS = ["Post", "Comm"]
LANG = ["en", "de"]


def random_graph(seed: int, n_vertices: int = 10, n_edges: int = 12) -> PropertyGraph:
    rng = np.random.default_rng(seed)
    vertices = [
        {
            "id": i,
            "label": LABELS[int(rng.integers(0, 2))],
            "properties": {"lang": LANG[int(rng.integers(0, 2))]} if rng.random() < 0.8 else {},
        }
        for i in range(1, n_vertices + 1)
    ]
    edges = []
    for j in range(n_edges):
        edges.append(
            {
                "id": 100 + j,
                "src": int(rng.integers(1, n_vertices + 1)),
                "dst": int(rng.integers(1, n_vertices + 1)),
                "type": "REPLY" if rng.random() < 0.8 else "OTHER",
                "properties": {},
            }
        )
    return PropertyGraph.from_rows(vertices, edges)


def random_stream(graph: PropertyGraph, n: int, seed: int):
    """Random valid transactions, chosen against an evolving working copy."""
    rng = np.random.default_rng(seed)
    txns = []
    while len(txns) < n:
        v = graph.vertices_pandas()
        e = graph.edges_pandas()
        vids = [int(i) for i in v["id"]]
        eids = [int(i) for i in e["id"]]
        choice = rng.random()
        if choice < 0.2:
            t = tx.single(
                tx.AddVertex(
                    graph.fresh_id(),
                    LABELS[int(rng.integers(0, 2))],
                    {"lang": LANG[int(rng.integers(0, 2))]},
                )
            )
        elif choice < 0.45 and len(vids) >= 2:
            t = tx.single(
                tx.AddEdge(
                    graph.fresh_id(),
                    int(rng.choice(vids)),
                    int(rng.choice(vids)),
                    "REPLY" if rng.random() < 0.8 else "OTHER",
                )
            )
        elif choice < 0.6 and eids:
            t = tx.single(tx.DeleteEdge(int(rng.choice(eids))))
        elif choice < 0.7 and len(vids) > 4:
            t = tx.single(tx.DeleteVertex(int(rng.choice(vids))))
        elif choice < 0.9 and vids:
            t = tx.single(
                tx.SetProperty(
                    "vertex", int(rng.choice(vids)), "lang", LANG[int(rng.integers(0, 2))]
                )
            )
        elif vids:
            t = tx.single(tx.RemoveProperty("vertex", int(rng.choice(vids)), "lang"))
        else:
            continue
        graph.apply(t)  # keep the working copy in sync so later ops are valid
        txns.append(t)
    return txns


TRANSITIVE_Q = "MATCH t = (p:Post)-[:REPLY*..4]->(c:Comm) WHERE c.lang = p.lang RETURN p, c, t"
JOIN_Q = "MATCH (a:Post)-[:REPLY]->(b) WHERE a.lang = b.lang RETURN a, b"
ANTI_Q = "MATCH (a:Post) WHERE NOT EXISTS { (a)-[:REPLY]->(x:Comm) } RETURN a"

TRANSITIVE_SQL = (
    TRAIL_CTE.format(type="REPLY")
    + """
SELECT vp.id AS p, vc.id AS c, pa.vstr AS t
FROM paths pa
JOIN vertices vp ON vp.id = pa.root AND vp.label = 'Post'
JOIN vertices vc ON vc.id = pa.cur AND vc.label = 'Comm'
WHERE vp.p_lang = vc.p_lang AND len(pa.es) <= 4
"""
)


@pytest.mark.parametrize("seed", [1, 2, 3])
def test_random_stream_transitive(spark, seed):
    def factory():
        return random_graph(seed)

    txns = random_stream(factory(), n=5, seed=seed + 100)
    check_incremental_vs_recompute(spark, factory, TRANSITIVE_Q, txns)

    # final-state DuckDB oracle check
    g = factory()
    for t in txns:
        g.apply(t)
    from repro.core.session import prepare_view

    view = prepare_view(spark, factory(), TRANSITIVE_Q, mode="incremental")
    view.initialize()
    for t in txns:
        view.apply(t)
    got = path_col_to_str(view.results(), "t__vs", "t").drop(columns=["t__es"])
    assert_bag_equal(got, oracle_query(g, TRANSITIVE_SQL, "lang"), f"seed {seed} oracle")


@pytest.mark.parametrize("seed", [4, 5])
def test_random_stream_join(spark, seed):
    def factory():
        return random_graph(seed)

    txns = random_stream(factory(), n=6, seed=seed + 200)
    check_incremental_vs_recompute(spark, factory, JOIN_Q, txns)


@pytest.mark.parametrize("seed", [6, 7])
def test_random_stream_antijoin(spark, seed):
    def factory():
        return random_graph(seed)

    txns = random_stream(factory(), n=6, seed=seed + 300)
    check_incremental_vs_recompute(spark, factory, ANTI_Q, txns)
