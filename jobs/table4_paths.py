"""Table 4 — atomic-path maintenance vs. recomputation on reply chains.

Usage: ``spark-submit jobs/table4_paths.py``.
"""
try:
    from jobs._common import get_spark  # repo root on sys.path
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import get_spark

from repro.bench.tables import table4_paths


def main() -> None:
    spark = get_spark("table4_paths")
    _rows, text = table4_paths(spark, depths=(2, 4, 6, 8, 12))
    print(text)
    spark.stop()


if __name__ == "__main__":
    main()
