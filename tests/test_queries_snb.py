"""SNB-lite workload queries (table T1) against the DuckDB oracle."""
import pytest

from repro.graph import transactions as tx
from repro.graph.generators import SnbSpec, snb_lite

from tests.util import (
    TRAIL_CTE,
    assert_bag_equal,
    check_incremental_vs_recompute,
    oracle_query,
    path_col_to_str,
    run_batch,
)

Q1 = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"
Q2 = "MATCH (a:Person)-[:KNOWS]->(b:Person)-[:LIKES]->(m:Post) WHERE a.country = b.country RETURN a, b, m"
Q3 = "MATCH (p:Post) WHERE p.lang = 'en' RETURN p"
Q4 = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang UNWIND nodes(t) AS n RETURN p, n"

Q1_SQL = (
    TRAIL_CTE.format(type="REPLY")
    + """
SELECT vp.id AS p, pa.vstr AS t
FROM paths pa
JOIN vertices vp ON vp.id = pa.root AND vp.label = 'Post'
JOIN vertices vc ON vc.id = pa.cur AND vc.label = 'Comm'
WHERE vp.p_lang = vc.p_lang
"""
)

Q2_SQL = """
SELECT k.src AS a, k.dst AS b, l.dst AS m
FROM edges k
JOIN edges l ON l.src = k.dst AND l.type = 'LIKES'
JOIN vertices va ON va.id = k.src AND va.label = 'Person'
JOIN vertices vb ON vb.id = k.dst AND vb.label = 'Person'
JOIN vertices vm ON vm.id = l.dst AND vm.label = 'Post'
WHERE k.type = 'KNOWS' AND va.p_country = vb.p_country
"""

Q3_SQL = "SELECT id AS p FROM vertices WHERE label = 'Post' AND p_lang = 'en'"


def test_q1_oracle(spark, snb_small):
    got = run_batch(spark, snb_small, Q1)
    got = path_col_to_str(got, "t__vs", "t").drop(columns=["t__es"])
    assert_bag_equal(got, oracle_query(snb_small, Q1_SQL, "lang"))


def test_q1_nonempty(spark, snb_small):
    assert len(run_batch(spark, snb_small, Q1)) > 0


def test_q2_oracle(spark, snb_small):
    got = run_batch(spark, snb_small, Q2)
    assert_bag_equal(got, oracle_query(snb_small, Q2_SQL, "country"))


def test_q3_oracle(spark, snb_small):
    got = run_batch(spark, snb_small, Q3)
    assert_bag_equal(got, oracle_query(snb_small, Q3_SQL, "lang"))


def test_q4_unwind_counts(spark, snb_small):
    q1 = run_batch(spark, snb_small, Q1)
    q4 = run_batch(spark, snb_small, Q4)
    # each Q1 path of k vertices contributes k unwound rows
    assert len(q4) == sum(len(t) for t in q1["t__vs"])


@pytest.mark.parametrize("query", [Q1, Q2, Q3], ids=["Q1", "Q2", "Q3"])
def test_snb_update_stream_equivalence(spark, query):
    spec = SnbSpec(n_persons=8, n_posts=5, comments_per_post=3, seed=9)

    def factory():
        return snb_lite(spec)

    g = factory()
    post = int(g.vertices_pandas().query("label == 'Post'")["id"].iloc[0])
    person = int(g.vertices_pandas().query("label == 'Person'")["id"].iloc[0])
    nid = 100000
    txns = [
        tx.Transaction(
            [tx.AddVertex(nid, "Comm", {"lang": "en"}), tx.AddEdge(nid + 1, post, nid, "REPLY")]
        ),
        tx.single(tx.SetProperty("vertex", post, "lang", "hu")),
        tx.single(tx.AddEdge(nid + 2, person, post, "LIKES")),
        tx.single(tx.DeleteVertex(nid)),
        tx.single(tx.SetProperty("vertex", person, "country", "HU")),
    ]
    check_incremental_vs_recompute(spark, factory, query, txns)
