"""Train-Benchmark-lite well-formedness queries (table T2), oracle-checked."""
import pytest

from repro.bench.workloads import railway_inject_repair
from repro.graph.generators import RailwaySpec, railway_lite

from tests.util import (
    assert_bag_equal,
    check_incremental_vs_recompute,
    oracle_query,
    run_batch,
)

POS_LENGTH = "MATCH (s:Segment) WHERE s.length <= 0 RETURN s"

SWITCH_SET = (
    "MATCH (r:Route)-[:entry]->(sem:Semaphore), "
    "(r)-[:follows]->(swp:SwitchPosition)-[:target]->(sw:Switch) "
    "WHERE sem.signal = 'GO' AND sw.currentPosition <> swp.position "
    "RETURN r, sem, swp, sw"
)

ROUTE_SENSOR = (
    "MATCH (r:Route)-[:follows]->(swp:SwitchPosition)-[:target]->(sw:Switch)"
    "-[:monitoredBy]->(sen:Sensor) "
    "WHERE NOT EXISTS { (r)-[:requires]->(sen) } "
    "RETURN r, sen, swp, sw"
)

CONNECTED_SEGMENTS = (
    "MATCH (s1:Segment)-[:connectsTo]->(s2:Segment)-[:connectsTo]->(s3:Segment), "
    "(s1)-[:monitoredBy]->(x:Sensor), (s2)-[:monitoredBy]->(x), (s3)-[:monitoredBy]->(x) "
    "RETURN s1, s2, s3, x"
)

QUERIES = {
    "PosLength": POS_LENGTH,
    "SwitchSet": SWITCH_SET,
    "RouteSensor": ROUTE_SENSOR,
    "ConnectedSegments": CONNECTED_SEGMENTS,
}

POS_LENGTH_SQL = (
    "SELECT id AS s FROM vertices "
    "WHERE label='Segment' AND TRY_CAST(p_length AS DOUBLE) <= 0"
)

SWITCH_SET_SQL = """
SELECT en.src AS r, en.dst AS sem, f.dst AS swp, t.dst AS sw
FROM edges en
JOIN edges f ON f.src = en.src AND f.type = 'follows'
JOIN edges t ON t.src = f.dst AND t.type = 'target'
JOIN vertices vr ON vr.id = en.src AND vr.label = 'Route'
JOIN vertices vsem ON vsem.id = en.dst AND vsem.label = 'Semaphore'
JOIN vertices vswp ON vswp.id = f.dst AND vswp.label = 'SwitchPosition'
JOIN vertices vsw ON vsw.id = t.dst AND vsw.label = 'Switch'
WHERE en.type = 'entry' AND vsem.p_signal = 'GO'
  AND vsw.p_currentPosition <> vswp.p_position
"""

ROUTE_SENSOR_SQL = """
SELECT f.src AS r, m.dst AS sen, f.dst AS swp, t.dst AS sw
FROM edges f
JOIN edges t ON t.src = f.dst AND t.type = 'target'
JOIN edges m ON m.src = t.dst AND m.type = 'monitoredBy'
JOIN vertices vr ON vr.id = f.src AND vr.label = 'Route'
JOIN vertices vswp ON vswp.id = f.dst AND vswp.label = 'SwitchPosition'
JOIN vertices vsw ON vsw.id = t.dst AND vsw.label = 'Switch'
JOIN vertices vsen ON vsen.id = m.dst AND vsen.label = 'Sensor'
WHERE f.type = 'follows'
  AND NOT EXISTS (
    SELECT 1 FROM edges q
    WHERE q.type = 'requires' AND q.src = f.src AND q.dst = m.dst
  )
"""

CONNECTED_SEGMENTS_SQL = """
SELECT c1.src AS s1, c1.dst AS s2, c2.dst AS s3, m1.dst AS x
FROM edges c1
JOIN edges c2 ON c2.src = c1.dst AND c2.type = 'connectsTo' AND c2.id <> c1.id
JOIN edges m1 ON m1.src = c1.src AND m1.type = 'monitoredBy'
JOIN edges m2 ON m2.src = c1.dst AND m2.type = 'monitoredBy' AND m2.dst = m1.dst
JOIN edges m3 ON m3.src = c2.dst AND m3.type = 'monitoredBy' AND m3.dst = m1.dst
JOIN vertices v1 ON v1.id = c1.src AND v1.label = 'Segment'
JOIN vertices v2 ON v2.id = c1.dst AND v2.label = 'Segment'
JOIN vertices v3 ON v3.id = c2.dst AND v3.label = 'Segment'
JOIN vertices vx ON vx.id = m1.dst AND vx.label = 'Sensor'
WHERE c1.type = 'connectsTo'
  AND m1.id <> m2.id AND m1.id <> m3.id AND m2.id <> m3.id
"""


def test_poslength_oracle(spark, railway_small):
    got = run_batch(spark, railway_small, POS_LENGTH)
    assert_bag_equal(got, oracle_query(railway_small, POS_LENGTH_SQL, "length"))


def test_poslength_finds_seeded_faults(spark, railway_small):
    assert len(run_batch(spark, railway_small, POS_LENGTH)) > 0


def test_switchset_oracle(spark, railway_small):
    got = run_batch(spark, railway_small, SWITCH_SET)
    expected = oracle_query(railway_small, SWITCH_SET_SQL, "signal", "currentPosition", "position")
    assert_bag_equal(got, expected)


def test_routesensor_oracle(spark, railway_small):
    got = run_batch(spark, railway_small, ROUTE_SENSOR)
    assert_bag_equal(got, oracle_query(railway_small, ROUTE_SENSOR_SQL))


def test_routesensor_finds_seeded_faults(spark, railway_small):
    assert len(run_batch(spark, railway_small, ROUTE_SENSOR)) > 0


def test_connectedsegments_oracle(spark, railway_small):
    got = run_batch(spark, railway_small, CONNECTED_SEGMENTS)
    assert_bag_equal(got, oracle_query(railway_small, CONNECTED_SEGMENTS_SQL))


def test_connectedsegments_nonempty(spark, railway_small):
    assert len(run_batch(spark, railway_small, CONNECTED_SEGMENTS)) > 0


@pytest.mark.parametrize("name", list(QUERIES), ids=list(QUERIES))
def test_inject_repair_equivalence(spark, name):
    spec = RailwaySpec(n_routes=3, switches_per_route=2, segments_per_sensor=3, seed=5)

    def factory():
        return railway_lite(spec)

    inject, repair = railway_inject_repair(factory(), name, n_faults=2, seed=1)
    check_incremental_vs_recompute(spark, factory, QUERIES[name], inject + repair)


@pytest.mark.parametrize("name", list(QUERIES), ids=list(QUERIES))
def test_inject_then_repair_restores_result(spark, name):
    from repro.core.session import prepare_view

    g = railway_lite(RailwaySpec(n_routes=3, seed=7))
    view = prepare_view(spark, g, QUERIES[name], mode="incremental")
    view.initialize()
    before = view.results()
    inject, repair = railway_inject_repair(g, name, n_faults=2, seed=2)
    for t in inject:
        view.apply(t)
    mid = view.results()
    assert len(mid) >= len(before)  # faults only add violations
    for t in repair:
        view.apply(t)
    assert_bag_equal(view.results(), before, f"{name} repair restores")
