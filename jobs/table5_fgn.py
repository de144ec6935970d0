"""Table 5 — fine-grained nested updates (FGN).

Usage: ``spark-submit jobs/table5_fgn.py``.
"""
try:
    from jobs._common import get_spark  # repo root on sys.path
except ImportError:  # spark-submit puts jobs/ itself on sys.path
    from _common import get_spark

from repro.bench.tables import table5_fgn
from repro.graph.generators import SnbSpec


def main() -> None:
    spark = get_spark("table5_fgn")
    _rows, text = table5_fgn(
        spark, SnbSpec(n_persons=40, n_posts=30, comments_per_post=5, seed=0), n_updates=8
    )
    print(text)
    spark.stop()


if __name__ == "__main__":
    main()
