"""Table 2 benchmark: Train Benchmark-lite inject/repair (DESIGN.md T2)."""
import pathlib

from repro.bench.tables import table2_train
from repro.graph.generators import RailwaySpec

SIZES = {
    "small": RailwaySpec(n_routes=3, switches_per_route=2, segments_per_sensor=3, seed=0),
    "medium": RailwaySpec(n_routes=8, switches_per_route=3, segments_per_sensor=4, seed=0),
}

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


def test_t2_train_inject_repair(spark, benchmark):
    rows, text = benchmark.pedantic(
        lambda: table2_train(spark, SIZES, n_faults=2),
        rounds=1,
        iterations=1,
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table2_train.txt").write_text(text + "\n")
    print("\n" + text)

    for r in rows:
        assert r["rec_rows"] > r["inc_rows"], r
