"""Table 1 benchmark: IVM vs. full recomputation on SNB-lite (DESIGN.md T1).

Scaled-down configuration of ``jobs/table1_snb.py``; asserts the *shape*
the paper's claim implies — incremental maintenance touches far fewer rows
than recomputation, increasingly so on larger graphs — and records the
table under ``bench_results/``.
"""
import pathlib

from repro.bench.tables import table1_snb
from repro.graph.generators import SnbSpec

SIZES = {
    "small": SnbSpec(n_persons=15, n_posts=10, comments_per_post=4, seed=0),
    "medium": SnbSpec(n_persons=40, n_posts=30, comments_per_post=5, seed=0),
}

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


def test_t1_snb_maintenance(spark, benchmark):
    rows, text = benchmark.pedantic(
        lambda: table1_snb(spark, SIZES, queries=("Q1-thread", "Q3-filter"), n_txns=6),
        rounds=1,
        iterations=1,
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table1_snb.txt").write_text(text + "\n")
    print("\n" + text)

    # Shape assertions (machine-independent): incremental work ≪ recompute work.
    for r in rows:
        assert r["rec_rows"] > r["inc_rows"], r
    # The rows-ratio advantage must grow with graph size for the transitive query.
    q1 = {r["size"]: r for r in rows if r["query"] == "Q1-thread"}
    assert q1["medium"]["rows_ratio"] > q1["small"]["rows_ratio"]
