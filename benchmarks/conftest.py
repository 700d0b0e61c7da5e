"""Session-scoped worlds for the benchmark suite.

``table3_world`` is the paper's default synthetic configuration (5 floors,
721 partitions); ``table4_world`` is the full simulated mall (977
partitions, trajectory-fitted flows, counted on Spark).  Construction cost
is paid once per session; the benchmarks measure per-query work only.
"""
from __future__ import annotations

import pytest

from repro.experiments.params import Settings
from repro.experiments.world import build_mall_world, build_synthetic_world


@pytest.fixture(scope="session")
def table3_world():
    return build_synthetic_world(Settings(n_instances=5))


@pytest.fixture(scope="session")
def table4_world(spark):
    return build_mall_world(Settings(n_instances=5), spark)
