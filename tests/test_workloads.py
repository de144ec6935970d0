"""Workload/transaction-stream generator tests (no Spark needed)."""
import pytest

from repro.bench import workloads
from repro.graph import transactions as tx
from repro.graph.generators import RailwaySpec, SnbSpec, railway_lite, snb_lite


@pytest.fixture(scope="module")
def snb():
    return snb_lite(SnbSpec(n_persons=10, n_posts=6, comments_per_post=3, seed=1))


@pytest.fixture(scope="module")
def railway():
    return railway_lite(RailwaySpec(n_routes=4, fault_rate=0.2, seed=1))


# -------------------------------------------------------------- snb stream

def test_snb_stream_length(snb):
    assert len(workloads.snb_stream(snb, n=10, seed=0)) == 10


def test_snb_stream_deterministic(snb):
    a = workloads.snb_stream(snb, n=8, seed=3)
    b = workloads.snb_stream(snb, n=8, seed=3)
    assert a == b


def test_snb_stream_applies_cleanly(snb):
    g = snb_lite(SnbSpec(n_persons=10, n_posts=6, comments_per_post=3, seed=1))
    for t in workloads.snb_stream(snb, n=12, seed=0):
        g.apply(t)  # must not raise


def test_snb_stream_applies_to_fresh_copy(snb):
    """The stream must be valid against any identical copy of the graph."""
    txns = workloads.snb_stream(snb, n=12, seed=5)
    for copy_seed in range(2):
        g = snb_lite(SnbSpec(n_persons=10, n_posts=6, comments_per_post=3, seed=1))
        for t in txns:
            g.apply(t)


def test_snb_stream_mixes_operation_kinds(snb):
    txns = workloads.snb_stream(snb, n=12, seed=0)
    kinds = {type(op).__name__ for t in txns for op in t}
    assert {"AddVertex", "AddEdge", "SetProperty"} <= kinds


# ------------------------------------------------------------ inject/repair

@pytest.mark.parametrize("query", workloads.TB_QUERIES)
def test_inject_repair_counts(railway, query):
    inject, repair = workloads.railway_inject_repair(railway, query, n_faults=2, seed=0)
    assert len(inject) == 2 and len(repair) == 2


@pytest.mark.parametrize("query", workloads.TB_QUERIES)
def test_inject_repair_apply_cleanly(query):
    g = railway_lite(RailwaySpec(n_routes=4, fault_rate=0.2, seed=1))
    inject, repair = workloads.railway_inject_repair(g, query, n_faults=2, seed=0)
    for t in list(inject) + list(repair):
        g.apply(t)


@pytest.mark.parametrize("query", workloads.TB_QUERIES)
def test_inject_repair_roundtrips_graph(query):
    """After inject + repair the graph content is unchanged (mod new ids)."""
    g = railway_lite(RailwaySpec(n_routes=4, fault_rate=0.2, seed=1))
    v0, e0 = g.vertices_pandas(), g.edges_pandas()
    inject, repair = workloads.railway_inject_repair(g, query, n_faults=2, seed=0)
    for t in list(inject) + list(repair):
        g.apply(t)
    v1 = g.vertices_pandas()
    e1 = g.edges_pandas()
    assert v1.sort_values("id").reset_index(drop=True).equals(
        v0.sort_values("id").reset_index(drop=True)
    )
    assert e1.sort_values("id").reset_index(drop=True).equals(
        e0.sort_values("id").reset_index(drop=True)
    )


def test_unknown_query_rejected(railway):
    with pytest.raises(ValueError, match="unknown"):
        workloads.railway_inject_repair(railway, "Nope", n_faults=1, seed=0)


def test_poslength_inject_creates_fault(railway):
    inject, _repair = workloads.railway_inject_repair(railway, "PosLength", n_faults=1, seed=0)
    (op,) = inject[0].ops
    assert isinstance(op, tx.SetProperty) and op.key == "length" and op.value == "0"
