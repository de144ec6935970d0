"""Table 3 — minimal-schema inference vs. whole-property-map baseline.

Usage: ``spark-submit jobs/table3_schema.py``.
"""
try:
    from jobs._common import get_spark  # repo root on sys.path
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import get_spark

from repro.bench.tables import table3_schema
from repro.graph.generators import SnbSpec


def main() -> None:
    spark = get_spark("table3_schema")
    _rows, text = table3_schema(
        spark, SnbSpec(n_persons=50, n_posts=40, comments_per_post=5, seed=0), n_txns=6
    )
    print(text)
    spark.stop()


if __name__ == "__main__":
    main()
