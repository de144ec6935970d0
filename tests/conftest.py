"""Test-suite tuning + shared graph fixtures.

The session ``spark`` fixture comes from the root conftest. Data here is
tiny (unit-test scale), so fewer shuffle partitions cut per-job fixed
overhead substantially across the many Spark-backed tests; the root
conftest honours this env var when it builds the session.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pytest

from repro.graph.generators import RailwaySpec, SnbSpec, example_graph, railway_lite, snb_lite


@pytest.fixture()
def example():
    return example_graph()


@pytest.fixture(scope="module")
def snb_small():
    return snb_lite(SnbSpec(n_persons=12, n_posts=8, comments_per_post=4, seed=42))


@pytest.fixture(scope="module")
def railway_small():
    return railway_lite(RailwaySpec(n_routes=5, fault_rate=0.25, seed=42))
