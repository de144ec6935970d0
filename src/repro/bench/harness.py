"""Benchmark harness: maintenance-latency measurement + table rendering.

Measures, for one engine (incremental or recompute) over one transaction
stream: initialization time, per-transaction latency, and the
machine-independent **rows touched** metric (delta rows processed per node
for the incremental engine; operator output rows for the recompute
baseline — see DESIGN.md §2). Tables are printed in a fixed-width format
that EXPERIMENTS.md records verbatim.
"""
from __future__ import annotations

import statistics
import time
from dataclasses import dataclass, field
from typing import Callable, List, Optional, Sequence

from repro.graph.transactions import Transaction


@dataclass
class MaintenanceRun:
    """Result of driving one engine through one transaction stream."""

    label: str
    init_s: float
    latencies_s: List[float]
    rows_touched: int
    view_rows: int

    @property
    def mean_latency_s(self) -> float:
        return statistics.fmean(self.latencies_s) if self.latencies_s else 0.0

    @property
    def median_latency_s(self) -> float:
        return statistics.median(self.latencies_s) if self.latencies_s else 0.0

    @property
    def total_s(self) -> float:
        return sum(self.latencies_s)


def drive(engine, txns: Sequence[Transaction], *, label: str, instrument: bool = False) -> MaintenanceRun:
    """Initialize ``engine`` and apply ``txns``, timing each apply.

    ``instrument=True`` additionally counts rows touched (extra Spark
    actions for the recompute engine — use a separate run when timing).
    """
    t0 = time.perf_counter()
    engine.initialize()
    init_s = time.perf_counter() - t0

    latencies: List[float] = []
    rows = 0
    for t in txns:
        t0 = time.perf_counter()
        if hasattr(engine, "apply") and "instrument" in engine.apply.__code__.co_varnames:
            stats = engine.apply(t, instrument=instrument)
        else:
            stats = engine.apply(t)
        latencies.append(time.perf_counter() - t0)
        rows += stats.rows_touched
    return MaintenanceRun(
        label=label,
        init_s=init_s,
        latencies_s=latencies,
        rows_touched=rows,
        view_rows=len(engine.results()),
    )


def fmt_table(title: str, headers: Sequence[str], rows: Sequence[Sequence]) -> str:
    """Fixed-width table (markdown-ish) used by jobs/ and EXPERIMENTS.md."""
    cells = [[str(h) for h in headers]] + [[_fmt(c) for c in r] for r in rows]
    widths = [max(len(row[i]) for row in cells) for i in range(len(headers))]
    lines = [title]
    lines.append(" | ".join(h.ljust(w) for h, w in zip(cells[0], widths)))
    lines.append("-|-".join("-" * w for w in widths))
    for r in cells[1:]:
        lines.append(" | ".join(c.ljust(w) for c, w in zip(r, widths)))
    return "\n".join(lines)


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.4f}" if abs(v) < 100 else f"{v:.1f}"
    return str(v)


def speedup(a: float, b: float) -> float:
    """a / b guarded against zero."""
    return a / b if b > 0 else float("inf")
