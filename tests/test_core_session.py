"""Session façade + recompute baseline tests."""
import pytest

from repro.algebra import nra
from repro.core.session import compile_to_fra, prepare_view
from repro.core.recompute import RecomputeEngine
from repro.graph import transactions as tx
from repro.graph.generators import example_graph
from repro.ivm.engine import IncrementalEngine

from tests.util import assert_bag_equal

Q = "MATCH t = (p:Post)-[:REPLY*]->(c:Comm) WHERE c.lang = p.lang RETURN p, t"


def test_compile_to_fra_is_flat():
    plan = compile_to_fra(Q)
    assert not [n for n in nra.walk(plan) if isinstance(n, nra.Unnest)]


def test_compile_to_fra_baseline_keeps_unnest():
    plan = compile_to_fra(Q, pushdown=False)
    assert [n for n in nra.walk(plan) if isinstance(n, nra.Unnest)]


def test_prepare_view_modes(spark):
    g = example_graph()
    assert isinstance(prepare_view(spark, g, Q, mode="incremental"), IncrementalEngine)
    assert isinstance(prepare_view(spark, example_graph(), Q, mode="recompute"), RecomputeEngine)
    with pytest.raises(ValueError):
        prepare_view(spark, g, Q, mode="nope")


def test_recompute_engine_lifecycle(spark):
    g = example_graph()
    eng = prepare_view(spark, g, Q, mode="recompute")
    eng.initialize()
    r0 = eng.results()
    assert len(r0) == 2
    stats = eng.apply(tx.single(tx.SetProperty("vertex", 4, "lang", "en")))
    assert stats.view_delta_rows == 1
    assert len(eng.results()) == 3


def test_recompute_instrumented_counts_rows(spark):
    g = example_graph()
    eng = prepare_view(spark, g, Q, mode="recompute")
    eng.initialize()
    stats = eng.apply(tx.single(tx.SetProperty("vertex", 4, "lang", "en")), instrument=True)
    assert stats.rows_touched > 0


def test_incremental_results_match_recompute_initially(spark):
    inc = prepare_view(spark, example_graph(), Q, mode="incremental")
    rec = prepare_view(spark, example_graph(), Q, mode="recompute")
    inc.initialize()
    rec.initialize()
    assert_bag_equal(inc.results(), rec.results())


def test_state_cells_reported(spark):
    inc = prepare_view(spark, example_graph(), Q, mode="incremental")
    inc.initialize()
    assert inc.state_cells() > 0


def test_apply_before_initialize_fails(spark):
    inc = prepare_view(spark, example_graph(), Q, mode="incremental")
    with pytest.raises(AssertionError):
        inc.apply(tx.single(tx.SetProperty("vertex", 1, "lang", "en")))
