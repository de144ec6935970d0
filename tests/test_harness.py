"""Bench harness unit tests (no Spark needed)."""
from repro.bench.harness import MaintenanceRun, fmt_table, speedup


def run(lat):
    return MaintenanceRun(label="x", init_s=1.0, latencies_s=lat, rows_touched=5, view_rows=2)


def test_mean_latency():
    assert run([1.0, 2.0, 3.0]).mean_latency_s == 2.0


def test_median_latency():
    assert run([1.0, 10.0, 2.0]).median_latency_s == 2.0


def test_total():
    assert run([1.0, 2.0]).total_s == 3.0


def test_empty_latencies():
    r = run([])
    assert r.mean_latency_s == 0.0 and r.median_latency_s == 0.0


def test_speedup():
    assert speedup(10.0, 2.0) == 5.0
    assert speedup(1.0, 0.0) == float("inf")


def test_fmt_table_alignment():
    text = fmt_table("T", ["col", "x"], [["a", 1], ["bbbb", 2.5]])
    lines = text.splitlines()
    assert lines[0] == "T"
    assert "col" in lines[1] and "-|-" in lines[2]
    assert len(lines) == 5
    # all rows aligned to the same width
    assert len(set(len(l) for l in lines[1:])) == 1


def test_fmt_table_float_formatting():
    text = fmt_table("T", ["v"], [[1.23456789], [123.456]])
    assert "1.2346" in text and "123.5" in text
