"""Deterministic synthetic property graphs.

Three families, all seeded and scalable (DESIGN.md §3 substitutions):

* :func:`example_graph` — the paper's §2 running example (Posts, Comments,
  REPLY edges, ``lang`` properties), used in unit tests and docs.
* :func:`snb_lite` — an LDBC-SNB-flavoured social network: Persons (KNOWS,
  LIKES), Posts and transitive Comment reply-trees with languages. The
  paper's running example query is exactly a fragment of SNB.
* :func:`railway_lite` — a Train-Benchmark-flavoured railway model (Routes,
  Switches, SwitchPositions, Sensors, Segments, Semaphores) with seeded
  well-formedness faults, for the constraint-checking tables.

Vertex/edge ids are assigned densely from 1; generators return a fresh
:class:`~repro.graph.property_graph.PropertyGraph`.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

import numpy as np

from repro.graph.property_graph import PropertyGraph

LANGS = ["en", "de", "fr", "hu", "nl"]
COUNTRIES = ["UK", "DE", "FR", "HU", "NL", "US"]
POSITIONS = ["LEFT", "RIGHT", "STRAIGHT", "DIVERGING"]
SIGNALS = ["GO", "STOP", "FAILURE"]


def example_graph() -> PropertyGraph:
    """The running example of §2: one en thread, one de post with an en reply.

    REPLY edges point parent → child (β in the paper: s=1,t=2 then s=2,t=3),
    so the thread of Post 1 is 1→2→3. Post 4 (de) has an en Comment 5, which
    the ``lang`` filter of the example query must exclude.
    """
    vertices = [
        {"id": 1, "label": "Post", "properties": {"lang": "en"}},
        {"id": 2, "label": "Comm", "properties": {"lang": "en"}},
        {"id": 3, "label": "Comm", "properties": {"lang": "en"}},
        {"id": 4, "label": "Post", "properties": {"lang": "de"}},
        {"id": 5, "label": "Comm", "properties": {"lang": "en"}},
    ]
    edges = [
        {"id": 10, "src": 1, "dst": 2, "type": "REPLY", "properties": {}},
        {"id": 11, "src": 2, "dst": 3, "type": "REPLY", "properties": {}},
        {"id": 12, "src": 4, "dst": 5, "type": "REPLY", "properties": {}},
    ]
    return PropertyGraph.from_rows(vertices, edges)


@dataclass(frozen=True)
class SnbSpec:
    """Size knobs for :func:`snb_lite` (all counts are targets, not exact)."""

    n_persons: int = 20
    n_posts: int = 10
    comments_per_post: int = 5
    max_reply_depth: int = 4
    knows_per_person: int = 3
    likes_per_person: int = 2
    seed: int = 0


def snb_lite(spec: SnbSpec = SnbSpec()) -> PropertyGraph:
    """Social-network graph: reply trees under posts + a person layer.

    Reply trees are built by attaching each new Comment to a uniformly
    random existing message of the same post whose depth is below
    ``max_reply_depth`` (parent → child REPLY edge), giving the mix of
    shallow/deep threads the transitive query Q1 exercises. ~80 % of the
    messages in one thread share the post's language so the ``lang`` filter
    keeps most, not all, of each thread.
    """
    rng = np.random.default_rng(spec.seed)
    g = PropertyGraph()
    vertices: List[dict] = []
    edges: List[dict] = []
    next_id = 1

    def vid() -> int:
        nonlocal next_id
        i = next_id
        next_id += 1
        return i

    persons = []
    for _ in range(spec.n_persons):
        i = vid()
        persons.append(i)
        vertices.append(
            {
                "id": i,
                "label": "Person",
                "properties": {
                    "name": f"person{i}",
                    "country": str(rng.choice(COUNTRIES)),
                },
            }
        )

    posts = []
    # message -> (post, depth, lang-of-post) while building reply trees
    for _ in range(spec.n_posts):
        p = vid()
        posts.append(p)
        lang = str(rng.choice(LANGS))
        vertices.append({"id": p, "label": "Post", "properties": {"lang": lang}})
        thread = [(p, 0)]
        n_comments = int(rng.integers(0, 2 * spec.comments_per_post + 1))
        for _ in range(n_comments):
            eligible = [(m, d) for (m, d) in thread if d < spec.max_reply_depth]
            if not eligible:
                break
            parent, depth = eligible[int(rng.integers(0, len(eligible)))]
            c = vid()
            c_lang = lang if rng.random() < 0.8 else str(rng.choice(LANGS))
            vertices.append({"id": c, "label": "Comm", "properties": {"lang": c_lang}})
            edges.append(
                {"id": vid(), "src": parent, "dst": c, "type": "REPLY", "properties": {}}
            )
            thread.append((c, depth + 1))

    for a in persons:
        for b in rng.choice(persons, size=min(spec.knows_per_person, len(persons)), replace=False):
            if int(b) != a:
                edges.append(
                    {"id": vid(), "src": a, "dst": int(b), "type": "KNOWS", "properties": {}}
                )
        if posts:
            for m in rng.choice(posts, size=min(spec.likes_per_person, len(posts)), replace=False):
                edges.append(
                    {"id": vid(), "src": a, "dst": int(m), "type": "LIKES", "properties": {}}
                )

    return PropertyGraph.from_rows(vertices, edges)


@dataclass(frozen=True)
class RailwaySpec:
    """Size knobs for :func:`railway_lite`.

    ``fault_rate`` seeds initial well-formedness violations: segments with
    non-positive length (PosLength), switches mis-set vs. their switch
    position (SwitchSet), and routes missing a ``requires`` edge to a sensor
    of one of their switches (RouteSensor).
    """

    n_routes: int = 10
    switches_per_route: int = 3
    segments_per_sensor: int = 4
    fault_rate: float = 0.1
    seed: int = 0


def railway_lite(spec: RailwaySpec = RailwaySpec()) -> PropertyGraph:
    """Railway well-formedness model following the Train Benchmark shape.

    Per route: an entry Semaphore; ``switches_per_route`` SwitchPositions
    (``follows`` edges) each targeting a Switch; each Switch is
    ``monitoredBy`` a Sensor; the Route ``requires`` that Sensor (dropped
    with ``fault_rate`` → RouteSensor violations). Each Sensor also monitors
    a chain of Segments (``connectsTo``), lengths positive except a
    ``fault_rate`` share (→ PosLength violations). Switch current positions
    match their SwitchPosition except a ``fault_rate`` share (→ SwitchSet
    violations when the semaphore shows GO).
    """
    rng = np.random.default_rng(spec.seed)
    g_vertices: List[dict] = []
    g_edges: List[dict] = []
    next_id = 1

    def nid() -> int:
        nonlocal next_id
        i = next_id
        next_id += 1
        return i

    for _ in range(spec.n_routes):
        route = nid()
        g_vertices.append({"id": route, "label": "Route", "properties": {}})
        sem = nid()
        g_vertices.append(
            {
                "id": sem,
                "label": "Semaphore",
                "properties": {"signal": "GO" if rng.random() < 0.7 else "STOP"},
            }
        )
        g_edges.append({"id": nid(), "src": route, "dst": sem, "type": "entry", "properties": {}})

        for _ in range(spec.switches_per_route):
            swp = nid()
            pos = str(rng.choice(POSITIONS))
            g_vertices.append(
                {"id": swp, "label": "SwitchPosition", "properties": {"position": pos}}
            )
            g_edges.append(
                {"id": nid(), "src": route, "dst": swp, "type": "follows", "properties": {}}
            )
            sw = nid()
            cur = pos if rng.random() > spec.fault_rate else str(
                rng.choice([p for p in POSITIONS if p != pos])
            )
            g_vertices.append(
                {"id": sw, "label": "Switch", "properties": {"currentPosition": cur}}
            )
            g_edges.append(
                {"id": nid(), "src": swp, "dst": sw, "type": "target", "properties": {}}
            )
            sensor = nid()
            g_vertices.append({"id": sensor, "label": "Sensor", "properties": {}})
            g_edges.append(
                {"id": nid(), "src": sw, "dst": sensor, "type": "monitoredBy", "properties": {}}
            )
            if rng.random() > spec.fault_rate:
                g_edges.append(
                    {"id": nid(), "src": route, "dst": sensor, "type": "requires", "properties": {}}
                )
            prev_seg = None
            for _ in range(spec.segments_per_sensor):
                seg = nid()
                length = (
                    int(rng.integers(1, 100))
                    if rng.random() > spec.fault_rate
                    else -int(rng.integers(0, 10))
                )
                g_vertices.append(
                    {"id": seg, "label": "Segment", "properties": {"length": str(length)}}
                )
                g_edges.append(
                    {"id": nid(), "src": seg, "dst": sensor, "type": "monitoredBy", "properties": {}}
                )
                if prev_seg is not None:
                    g_edges.append(
                        {
                            "id": nid(),
                            "src": prev_seg,
                            "dst": seg,
                            "type": "connectsTo",
                            "properties": {},
                        }
                    )
                prev_seg = seg

    return PropertyGraph.from_rows(g_vertices, g_edges)
