"""Benchmarks for the substrate layers behind Tables 3/4.

Population-derivation kernels (the cost driver the paper's Section 5.3
complexity analysis compares), the microsimulation, and the probabilistic
flow counting.
"""
import numpy as np
import pytest

from repro.core.estimators import (
    GlobalEstimator,
    LocalEstimator,
    NTEstimator,
    PPEstimator,
)
from repro.sim.microsim import simulate

DERIVE_TICKS = 120


@pytest.mark.parametrize(
    "name,factory",
    [
        ("global", GlobalEstimator),
        ("local", LocalEstimator),
        ("pp", PPEstimator),
        ("nt", NTEstimator),
    ],
)
def test_population_derivation(benchmark, table3_world, name, factory):
    """Derive every partition's population DERIVE_TICKS ahead (k|V| work)."""
    m = table3_world.model
    target = m.tick_l + DERIVE_TICKS

    def derive():
        est = factory(m)
        for v in range(0, m.n_partitions, 7):
            est.population(v, target)

    benchmark.pedantic(derive, rounds=3, iterations=1, warmup_rounds=1)


def test_microsim_full_horizon(benchmark, table3_world):
    w = table3_world
    benchmark.pedantic(
        simulate,
        args=(w.model, w.bs.pop0),
        kwargs={"seed": 1},
        rounds=2,
        iterations=1,
    )


def test_flow_counting_pandas(benchmark):
    from repro.dataflow.trajectory_flows import count_door_flows_pandas
    from repro.space.mall import simulate_trajectories
    from tests.conftest import make_tiny_space

    bs = make_tiny_space()
    tw = simulate_trajectories(bs, n_objects=100, session_ticks=30, seed=2)
    benchmark.pedantic(
        count_door_flows_pandas,
        args=(bs.model, tw.fixes),
        rounds=3,
        iterations=1,
    )
