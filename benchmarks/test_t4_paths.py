"""Table 4 benchmark: atomic-path maintenance on reply chains."""
import pathlib

from repro.bench.tables import table4_paths

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


def test_t4_path_maintenance(spark, benchmark):
    rows, text = benchmark.pedantic(
        lambda: table4_paths(spark, depths=(2, 4, 6, 8)),
        rounds=1,
        iterations=1,
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table4_paths.txt").write_text(text + "\n")
    print("\n" + text)

    deletes = [r for r in rows if r["op"] == "delete-root-edge"]
    inserts = [r for r in rows if r["op"] == "insert-leaf"]
    # Insertion: maintenance touches fewer rows than recomputing the grown
    # view, and its cost grows with depth (new paths = ancestors of the leaf).
    for r in inserts:
        assert r["inc_rows"] < r["rec_rows"], r
    assert inserts[-1]["inc_rows"] > inserts[0]["inc_rows"]
    # Deletion is atomic-path filtering: work proportional to the paths
    # removed (O(depth)), never a closure rebuild. (Recompute rows can be
    # *smaller* here — the post-delete view is nearly empty — but recompute
    # still pays the full fixpoint in wall-clock terms.)
    assert all(d["inc_rows"] <= 4 * d["depth"] for d in deletes)
