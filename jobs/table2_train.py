"""Table 2 — Train Benchmark-lite inject/repair.

Usage: ``spark-submit jobs/table2_train.py``.
"""
try:
    from jobs._common import get_spark  # repo root on sys.path
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import get_spark

from repro.bench.tables import table2_train
from repro.graph.generators import RailwaySpec

SIZES = {
    "small": RailwaySpec(n_routes=3, switches_per_route=2, segments_per_sensor=3, seed=0),
    "medium": RailwaySpec(n_routes=8, switches_per_route=3, segments_per_sensor=4, seed=0),
    "large": RailwaySpec(n_routes=20, switches_per_route=3, segments_per_sensor=5, seed=0),
}


def main() -> None:
    spark = get_spark("table2_train")
    _rows, text = table2_train(spark, SIZES, n_faults=3)
    print(text)
    spark.stop()


if __name__ == "__main__":
    main()
