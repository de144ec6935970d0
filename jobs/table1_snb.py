"""Table 1 — IVM vs. full recomputation on SNB-lite.

Usage: ``spark-submit jobs/table1_snb.py`` (or plain ``python``).
Full-size configuration of the T1 benchmark; prints the table recorded in
EXPERIMENTS.md.
"""
try:
    from jobs._common import get_spark  # repo root on sys.path
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import get_spark

from repro.bench.tables import table1_snb
from repro.graph.generators import SnbSpec

SIZES = {
    "small": SnbSpec(n_persons=15, n_posts=10, comments_per_post=4, seed=0),
    "medium": SnbSpec(n_persons=40, n_posts=30, comments_per_post=5, seed=0),
    "large": SnbSpec(n_persons=100, n_posts=80, comments_per_post=6, seed=0),
}


def main() -> None:
    spark = get_spark("table1_snb")
    _rows, text = table1_snb(spark, SIZES, n_txns=8)
    print(text)
    spark.stop()


if __name__ == "__main__":
    main()
