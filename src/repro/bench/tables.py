"""Table generators for the constructed evaluation (DESIGN.md §4).

Each ``table*`` function builds its workload, drives both engines, and
returns ``(rows, text)`` — the raw result rows (for assertions in
``benchmarks/``) and a formatted table (printed by ``jobs/`` and recorded
in EXPERIMENTS.md). Configurations are parameters so the pytest-benchmark
targets can run scaled-down versions of the same code paths.
"""
from __future__ import annotations

from typing import Dict, List, Sequence, Tuple

from repro.bench import workloads
from repro.bench.harness import MaintenanceRun, drive, fmt_table, speedup
from repro.core.session import prepare_view
from repro.graph import transactions as tx
from repro.graph.generators import RailwaySpec, SnbSpec, railway_lite, snb_lite
from repro.graph.property_graph import PropertyGraph

# The workload queries (T1: SNB; T2: Train Benchmark) ----------------------

SNB_QUERIES: Dict[str, str] = {
    "Q1-thread": (
        "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"
    ),
    "Q2-likes": (
        "MATCH (a:Person)-[:KNOWS]->(b:Person)-[:LIKES]->(m:Post) "
        "WHERE a.country = b.country RETURN a, b, m"
    ),
    "Q3-filter": "MATCH (p:Post) WHERE p.lang = 'en' RETURN p",
}

TB_QUERIES: Dict[str, str] = {
    "PosLength": "MATCH (s:Segment) WHERE s.length <= 0 RETURN s",
    "SwitchSet": (
        "MATCH (r:Route)-[:entry]->(sem:Semaphore), "
        "(r)-[:follows]->(swp:SwitchPosition)-[:target]->(sw:Switch) "
        "WHERE sem.signal = 'GO' AND sw.currentPosition <> swp.position "
        "RETURN r, sem, swp, sw"
    ),
    "RouteSensor": (
        "MATCH (r:Route)-[:follows]->(swp:SwitchPosition)-[:target]->(sw:Switch)"
        "-[:monitoredBy]->(sen:Sensor) "
        "WHERE NOT EXISTS { (r)-[:requires]->(sen) } "
        "RETURN r, sen, swp, sw"
    ),
    "ConnectedSegments": (
        "MATCH (s1:Segment)-[:connectsTo]->(s2:Segment)-[:connectsTo]->(s3:Segment), "
        "(s1)-[:monitoredBy]->(x:Sensor), (s2)-[:monitoredBy]->(x), "
        "(s3)-[:monitoredBy]->(x) RETURN s1, s2, s3, x"
    ),
}


def _compare_engines(
    spark, factory, cypher: str, txns, *, pushdown: bool = True
) -> Tuple[MaintenanceRun, MaintenanceRun, int]:
    """Run incremental (timed) + recompute (timed, then instrumented).

    Returns (incremental, recompute-timed, recompute rows touched).
    """
    inc = drive(
        prepare_view(spark, factory(), cypher, mode="incremental", pushdown=pushdown),
        txns,
        label="incremental",
    )
    rec = drive(
        prepare_view(spark, factory(), cypher, mode="recompute", pushdown=pushdown),
        txns,
        label="recompute",
    )
    rec_rows = drive(
        prepare_view(spark, factory(), cypher, mode="recompute", pushdown=pushdown),
        txns,
        label="recompute-metrics",
        instrument=True,
    ).rows_touched
    assert inc.view_rows == rec.view_rows, "engines disagree — correctness bug"
    return inc, rec, rec_rows


# ------------------------------------------------------------------ Table 1

def table1_snb(
    spark,
    sizes: Dict[str, SnbSpec],
    *,
    queries: Sequence[str] = ("Q1-thread", "Q2-likes", "Q3-filter"),
    n_txns: int = 8,
    seed: int = 0,
) -> Tuple[List[dict], str]:
    """IVM vs. recompute on SNB-lite: per-txn latency + rows touched."""
    rows: List[dict] = []
    for size_name, spec in sizes.items():
        base = snb_lite(spec)
        nv, ne = base.num_vertices, base.num_edges
        txns = workloads.snb_stream(base, n=n_txns, seed=seed)
        for qname in queries:
            factory = lambda: snb_lite(spec)  # noqa: E731
            inc, rec, rec_rows = _compare_engines(spark, factory, SNB_QUERIES[qname], txns)
            rows.append(
                {
                    "size": size_name,
                    "V": nv,
                    "E": ne,
                    "query": qname,
                    "inc_ms": inc.mean_latency_s * 1e3,
                    "rec_ms": rec.mean_latency_s * 1e3,
                    "speedup": speedup(rec.mean_latency_s, inc.mean_latency_s),
                    "inc_rows": inc.rows_touched,
                    "rec_rows": rec_rows,
                    "rows_ratio": speedup(rec_rows, max(inc.rows_touched, 1)),
                    "view_rows": inc.view_rows,
                }
            )
    text = fmt_table(
        "Table 1 — SNB-lite: incremental vs. full recomputation "
        f"(mean per-transaction, {n_txns} txns)",
        ["size", "|V|", "|E|", "query", "inc ms", "rec ms", "speedup",
         "inc rows", "rec rows", "rows ratio", "|view|"],
        [
            [r["size"], r["V"], r["E"], r["query"], r["inc_ms"], r["rec_ms"],
             r["speedup"], r["inc_rows"], r["rec_rows"], r["rows_ratio"], r["view_rows"]]
            for r in rows
        ],
    )
    return rows, text


# ------------------------------------------------------------------ Table 2

def table2_train(
    spark,
    sizes: Dict[str, RailwaySpec],
    *,
    queries: Sequence[str] = tuple(TB_QUERIES),
    n_faults: int = 3,
    seed: int = 0,
) -> Tuple[List[dict], str]:
    """Train Benchmark inject/repair: per-phase mean latency + rows."""
    rows: List[dict] = []
    for size_name, spec in sizes.items():
        base = railway_lite(spec)
        nv, ne = base.num_vertices, base.num_edges
        for qname in queries:
            inject, repair = workloads.railway_inject_repair(
                base, qname, n_faults=n_faults, seed=seed
            )
            factory = lambda: railway_lite(spec)  # noqa: E731
            inc, rec, rec_rows = _compare_engines(
                spark, factory, TB_QUERIES[qname], list(inject) + list(repair)
            )
            rows.append(
                {
                    "size": size_name,
                    "V": nv,
                    "E": ne,
                    "query": qname,
                    "inc_ms": inc.mean_latency_s * 1e3,
                    "rec_ms": rec.mean_latency_s * 1e3,
                    "speedup": speedup(rec.mean_latency_s, inc.mean_latency_s),
                    "inc_rows": inc.rows_touched,
                    "rec_rows": rec_rows,
                    "rows_ratio": speedup(rec_rows, max(inc.rows_touched, 1)),
                    "view_rows": inc.view_rows,
                }
            )
    text = fmt_table(
        f"Table 2 — Train Benchmark-lite inject+repair ({n_faults}+{n_faults} txns)",
        ["size", "|V|", "|E|", "query", "inc ms", "rec ms", "speedup",
         "inc rows", "rec rows", "rows ratio", "|view|"],
        [
            [r["size"], r["V"], r["E"], r["query"], r["inc_ms"], r["rec_ms"],
             r["speedup"], r["inc_rows"], r["rec_rows"], r["rows_ratio"], r["view_rows"]]
            for r in rows
        ],
    )
    return rows, text


# ------------------------------------------------------------------ Table 3

def table3_schema(
    spark,
    spec: SnbSpec,
    *,
    queries: Sequence[str] = ("Q1-thread", "Q2-likes"),
    n_txns: int = 4,
    seed: int = 0,
) -> Tuple[List[dict], str]:
    """Minimal-schema inference ON vs OFF: state size + latency."""
    rows: List[dict] = []
    base = snb_lite(spec)
    txns = workloads.snb_stream(base, n=n_txns, seed=seed)
    for qname in queries:
        for pushdown in (True, False):
            factory = lambda: snb_lite(spec)  # noqa: E731
            eng = prepare_view(
                spark, factory(), SNB_QUERIES[qname], mode="incremental", pushdown=pushdown
            )
            run = drive(eng, txns, label="inc")
            rows.append(
                {
                    "query": qname,
                    "pushdown": "minimal" if pushdown else "full-props",
                    "init_ms": run.init_s * 1e3,
                    "inc_ms": run.mean_latency_s * 1e3,
                    "state_cells": eng.state_cells(),
                    "view_rows": run.view_rows,
                }
            )
    text = fmt_table(
        "Table 3 — minimal-schema inference (property pushdown) vs. shipping "
        "whole property maps",
        ["query", "schema", "init ms", "inc ms", "state cells", "|view|"],
        [
            [r["query"], r["pushdown"], r["init_ms"], r["inc_ms"], r["state_cells"], r["view_rows"]]
            for r in rows
        ],
    )
    return rows, text


# ------------------------------------------------------------------ Table 4

def _reply_chain(depth: int) -> PropertyGraph:
    """A post with a depth-``depth`` linear reply thread (all en)."""
    vertices = [{"id": 1, "label": "Post", "properties": {"lang": "en"}}]
    edges = []
    for i in range(2, depth + 2):
        vertices.append({"id": i, "label": "Comm", "properties": {"lang": "en"}})
        edges.append(
            {"id": 100 + i, "src": i - 1, "dst": i, "type": "REPLY", "properties": {}}
        )
    return PropertyGraph.from_rows(vertices, edges)


def table4_paths(
    spark, depths: Sequence[int] = (2, 4, 6, 8), *, seed: int = 0
) -> Tuple[List[dict], str]:
    """Atomic-path maintenance: leaf insert vs. root delete vs. recompute."""
    q = SNB_QUERIES["Q1-thread"]
    rows: List[dict] = []
    for depth in depths:
        leaf = depth + 1
        ops = {
            "insert-leaf": tx.Transaction(
                [
                    tx.AddVertex(900, "Comm", {"lang": "en"}),
                    tx.AddEdge(901, leaf, 900, "REPLY"),
                ]
            ),
            "delete-root-edge": tx.single(tx.DeleteEdge(102)),
        }
        for op_name, op in ops.items():
            factory = lambda: _reply_chain(depth)  # noqa: E731
            inc, rec, rec_rows = _compare_engines(spark, factory, q, [op])
            rows.append(
                {
                    "depth": depth,
                    "op": op_name,
                    "inc_ms": inc.mean_latency_s * 1e3,
                    "rec_ms": rec.mean_latency_s * 1e3,
                    "speedup": speedup(rec.mean_latency_s, inc.mean_latency_s),
                    "inc_rows": inc.rows_touched,
                    "rec_rows": rec_rows,
                }
            )
    text = fmt_table(
        "Table 4 — atomic-path maintenance on a reply chain (single update)",
        ["depth", "operation", "inc ms", "rec ms", "speedup", "inc rows", "rec rows"],
        [
            [r["depth"], r["op"], r["inc_ms"], r["rec_ms"], r["speedup"],
             r["inc_rows"], r["rec_rows"]]
            for r in rows
        ],
    )
    return rows, text


# ------------------------------------------------------------------ Table 5

def table5_fgn(
    spark, spec: SnbSpec, *, n_updates: int = 5, seed: int = 0
) -> Tuple[List[dict], str]:
    """FGN: updates to a property the view reads vs. one it does not."""
    q = SNB_QUERIES["Q1-thread"]  # reads only 'lang'
    base = snb_lite(spec)
    import numpy as np

    rng = np.random.default_rng(seed)
    v = base.vertices_pandas()
    targets = [int(i) for i in rng.choice(v[v["label"] == "Comm"]["id"], size=n_updates)]
    streams = {
        "read-prop (lang)": [
            tx.single(tx.SetProperty("vertex", t, "lang", lang))
            for t, lang in zip(targets, ["de", "fr", "hu", "nl", "en"] * 3)
        ][:n_updates],
        "unread-prop (author)": [
            tx.single(tx.SetProperty("vertex", t, "author", f"user{k}"))
            for k, t in enumerate(targets)
        ],
    }
    rows: List[dict] = []
    for sname, txns in streams.items():
        factory = lambda: snb_lite(spec)  # noqa: E731
        run = drive(
            prepare_view(spark, factory(), q, mode="incremental"), txns, label=sname
        )
        rows.append(
            {
                "stream": sname,
                "inc_ms": run.mean_latency_s * 1e3,
                "rows": run.rows_touched,
                "view_rows": run.view_rows,
            }
        )
    text = fmt_table(
        f"Table 5 — fine-grained nested updates (FGN), {n_updates} property sets",
        ["update stream", "inc ms", "rows touched", "|view|"],
        [[r["stream"], r["inc_ms"], r["rows"], r["view_rows"]] for r in rows],
    )
    return rows, text
