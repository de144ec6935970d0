"""Transaction-stream generators for the evaluation tables.

Two families (DESIGN.md §4):

* **SNB update streams** (T1): mixed comment-subtree additions, reply-edge
  churn, property flips and likes — the social-network update mix the
  paper's running example lives in.
* **Train Benchmark inject/repair streams** (T2): per-query fault
  injection and repair, following the TB protocol shape (validate →
  inject faults incrementally → repair them incrementally).

All generators are deterministic in ``seed`` and *pure*: they inspect the
graph to pick targets but only return transactions; callers apply them.
"""
from __future__ import annotations

from typing import List

import numpy as np

from repro.graph import transactions as tx
from repro.graph.generators import LANGS, POSITIONS
from repro.graph.property_graph import PropertyGraph

TB_QUERIES = ("PosLength", "SwitchSet", "RouteSensor", "ConnectedSegments")


def snb_stream(graph: PropertyGraph, *, n: int, seed: int = 0) -> List[tx.Transaction]:
    """A mixed SNB update stream of ``n`` transactions.

    Mix (~cycling): add a comment replying to a random message, flip a
    message language, add/remove a LIKES edge, delete a leaf comment.
    Target ids are chosen against a *simulated* evolving id set so the
    stream applies cleanly to any copy of ``graph``.
    """
    rng = np.random.default_rng(seed)
    v = graph.vertices_pandas()
    posts = [int(i) for i in v[v["label"] == "Post"]["id"]]
    persons = [int(i) for i in v[v["label"] == "Person"]["id"]]
    comments = [int(i) for i in v[v["label"] == "Comm"]["id"]]
    e = graph.edges_pandas()
    reply_dst = set(int(x) for x in e[e["type"] == "REPLY"]["dst"])
    reply_src = set(int(x) for x in e[e["type"] == "REPLY"]["src"])
    # leaves: comments with no replies to them yet
    leaves = [c for c in comments if c not in reply_src]
    next_id = int(max(list(v["id"]) + list(e["id"]))) + 1

    out: List[tx.Transaction] = []
    added_comments: List[int] = []
    like_edges: List[int] = []
    while len(out) < n:
        kind = len(out) % 4
        if kind == 0 and (posts or comments):
            parent = int(rng.choice(posts + comments + added_comments))
            cid, eid = next_id, next_id + 1
            next_id += 2
            out.append(
                tx.Transaction(
                    [
                        tx.AddVertex(cid, "Comm", {"lang": str(rng.choice(LANGS))}),
                        tx.AddEdge(eid, parent, cid, "REPLY"),
                    ]
                )
            )
            added_comments.append(cid)
        elif kind == 1 and (posts or comments):
            target = int(rng.choice(posts + comments))
            out.append(tx.single(tx.SetProperty("vertex", target, "lang", str(rng.choice(LANGS)))))
        elif kind == 2 and persons and posts:
            eid = next_id
            next_id += 1
            out.append(
                tx.single(
                    tx.AddEdge(eid, int(rng.choice(persons)), int(rng.choice(posts)), "LIKES")
                )
            )
            like_edges.append(eid)
        elif kind == 3 and added_comments:
            out.append(tx.single(tx.DeleteVertex(added_comments.pop())))
        else:  # fallback: property flip on a person
            target = int(rng.choice(persons))
            out.append(tx.single(tx.SetProperty("vertex", target, "country", "XX")))
    return out


def railway_inject_repair(
    graph: PropertyGraph, query: str, *, n_faults: int, seed: int = 0
) -> tuple:
    """(inject, repair) transaction lists for one TB query.

    PosLength: set segment length non-positive / restore positive.
    SwitchSet: mis-set a switch under a GO semaphore / set it back.
    RouteSensor: delete a ``requires`` edge / re-add it.
    ConnectedSegments: splice an extra monitored segment into a chain /
    remove it again.
    """
    rng = np.random.default_rng(seed)
    v = graph.vertices_pandas().set_index("id")
    e = graph.edges_pandas()
    next_id = int(max(list(v.index) + list(e["id"]))) + 1
    inject: List[tx.Transaction] = []
    repair: List[tx.Transaction] = []

    if query == "PosLength":
        segs = [
            (int(i), p["length"])
            for i, p in v[v["label"] == "Segment"]["properties"].items()
            if int(p["length"]) > 0
        ]
        idx = rng.choice(len(segs), size=min(n_faults, len(segs)), replace=False)
        for k in idx:
            sid, old = segs[int(k)]
            inject.append(tx.single(tx.SetProperty("vertex", sid, "length", "0")))
            repair.append(tx.single(tx.SetProperty("vertex", sid, "length", old)))
    elif query == "SwitchSet":
        target = e[e["type"] == "target"]
        cands = []
        for _i, row in target.iterrows():
            swp, sw = int(row["src"]), int(row["dst"])
            pos = v.loc[swp, "properties"]["position"]
            cur = v.loc[sw, "properties"]["currentPosition"]
            if pos == cur:
                cands.append((sw, pos))
        idx = rng.choice(len(cands), size=min(n_faults, len(cands)), replace=False)
        for k in idx:
            sw, pos = cands[int(k)]
            bad = [p for p in POSITIONS if p != pos][int(rng.integers(0, 3))]
            inject.append(tx.single(tx.SetProperty("vertex", sw, "currentPosition", bad)))
            repair.append(tx.single(tx.SetProperty("vertex", sw, "currentPosition", pos)))
    elif query == "RouteSensor":
        req = e[e["type"] == "requires"]
        idx = rng.choice(len(req), size=min(n_faults, len(req)), replace=False)
        for k in idx:
            row = req.iloc[int(k)]
            eid, src, dst = int(row["id"]), int(row["src"]), int(row["dst"])
            inject.append(tx.single(tx.DeleteEdge(eid)))
            repair.append(tx.single(tx.AddEdge(eid, src, dst, "requires")))
    elif query == "ConnectedSegments":
        conn = e[e["type"] == "connectsTo"]
        mon = e[e["type"] == "monitoredBy"].set_index("src")["dst"]
        idx = rng.choice(len(conn), size=min(n_faults, len(conn)), replace=False)
        for k in idx:
            row = conn.iloc[int(k)]
            s1, s2 = int(row["src"]), int(row["dst"])
            sensor = int(mon.loc[s1])
            seg, e1, e2, e3 = next_id, next_id + 1, next_id + 2, next_id + 3
            next_id += 4
            inject.append(
                tx.Transaction(
                    [
                        tx.AddVertex(seg, "Segment", {"length": "5"}),
                        tx.AddEdge(e1, seg, sensor, "monitoredBy"),
                        tx.AddEdge(e2, s1, seg, "connectsTo"),
                        tx.AddEdge(e3, seg, s2, "connectsTo"),
                    ]
                )
            )
            repair.append(tx.single(tx.DeleteVertex(seg)))
    else:
        raise ValueError(f"unknown Train Benchmark query {query!r}")
    return inject, repair
