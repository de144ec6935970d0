"""Table 3 benchmark: minimal-schema inference vs. whole-map shipping."""
import pathlib

from repro.bench.tables import table3_schema
from repro.graph.generators import SnbSpec

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


def test_t3_schema_inference(spark, benchmark):
    rows, text = benchmark.pedantic(
        lambda: table3_schema(
            spark, SnbSpec(n_persons=25, n_posts=20, comments_per_post=5, seed=0), n_txns=4
        ),
        rounds=1,
        iterations=1,
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table3_schema.txt").write_text(text + "\n")
    print("\n" + text)

    by_query = {}
    for r in rows:
        by_query.setdefault(r["query"], {})[r["pushdown"]] = r
    for q, modes in by_query.items():
        # identical results…
        assert modes["minimal"]["view_rows"] == modes["full-props"]["view_rows"], q
        # …but the inferred minimal schema materializes less state.
        assert modes["minimal"]["state_cells"] < modes["full-props"]["state_cells"], q
