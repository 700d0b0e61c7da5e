"""Shared worlds for the test suite.

Session-scoped because world construction (space + microsim + query
generation) costs seconds; all tests treat them as read-only.  ``tiny_*``
is a one-floor 16-partition space for exhaustive/brute-force checks;
``small_world`` is a one-floor 141-partition world — the paper's per-floor
statistics at test-friendly cost.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.experiments.params import Settings
from repro.experiments.world import World, build_synthetic_world
from repro.sim.microsim import install_snapshot, simulate
from repro.space.floorplan import BuiltSpace, build_space
from repro.space.queries import generate_instances


def make_tiny_space(**overrides) -> BuiltSpace:
    kwargs = dict(
        floors=1,
        parts_per_floor=[16],
        doors_per_floor=[20],
        stairs_per_gap=[],
        floor_w=160.0,
        floor_h=160.0,
        q_per_floor=3,
        obj_max=100,
        lam_max=2.0,
        ti=10.0,
        horizon_ticks=80,
        seed=3,
    )
    kwargs.update(overrides)
    return build_space(**kwargs)


@pytest.fixture(scope="session")
def tiny_space() -> BuiltSpace:
    return make_tiny_space()


@pytest.fixture(scope="session")
def tiny_world(tiny_space) -> World:
    sim = simulate(tiny_space.model, tiny_space.pop0, seed=5)
    install_snapshot(tiny_space.model, sim.pop, sim.diff, tick_l=10)
    instances = generate_instances(tiny_space, n=5, s2t=120.0, tol=60.0, seed=2)
    return World(
        settings=Settings(n_instances=5, s2t=120.0, t_q=100.0),
        bs=tiny_space,
        gold_pop=sim.pop,
        instances=instances,
    )


@pytest.fixture(scope="session")
def small_world() -> World:
    settings = Settings(floors=1, n_instances=6, s2t=600.0, space_seed=7)
    return build_synthetic_world(settings)


@pytest.fixture(scope="session")
def rng() -> np.random.Generator:
    return np.random.default_rng(0)
