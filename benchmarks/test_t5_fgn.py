"""Table 5 benchmark: fine-grained nested updates (FGN)."""
import pathlib

from repro.bench.tables import table5_fgn
from repro.graph.generators import SnbSpec

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


def test_t5_fgn(spark, benchmark):
    rows, text = benchmark.pedantic(
        lambda: table5_fgn(
            spark, SnbSpec(n_persons=20, n_posts=15, comments_per_post=5, seed=0), n_updates=5
        ),
        rounds=1,
        iterations=1,
    )
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / "table5_fgn.txt").write_text(text + "\n")
    print("\n" + text)

    by_stream = {r["stream"]: r for r in rows}
    # FGN: an update to a property the view does not read dies at the scans.
    assert by_stream["unread-prop (author)"]["rows"] == 0
    assert by_stream["read-prop (lang)"]["rows"] > 0
