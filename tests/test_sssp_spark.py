"""Spark tests: iterative-join SSSP vs the driver Dijkstra."""
import numpy as np
import pytest

from repro.core.search import _cache, static_distances
from repro.dataflow.sssp_spark import sssp, state_transitions
from repro.oracle import assert_equivalent
from repro.space.geometry import IndoorPoint


@pytest.fixture(scope="module")
def env(spark, tiny_world):
    m = tiny_world.model
    rng = np.random.default_rng(1)
    ps = IndoorPoint(0, tiny_world.bs.random_point(rng, 0))
    return spark, m, ps


def test_transitions_count(env):
    spark, m, _ = env
    trans = state_transitions(spark, m)
    expected = sum(
        len(m.out_edges[int(m.e_dst[e])]) for e in range(m.n_edges)
    )
    assert trans.count() == expected


def test_transition_weights_nonnegative(env):
    spark, m, _ = env
    trans = state_transitions(spark, m)
    assert trans.where("weight < 0").count() == 0


def test_transitions_oracle_degree(env):
    """Out-transition counts per state vs DuckDB."""
    spark, m, _ = env
    trans = state_transitions(spark, m)
    got = trans.groupBy("state").count().withColumnRenamed("count", "n")
    sql = "SELECT state, COUNT(*) AS n FROM trans GROUP BY state"
    assert_equivalent(got, sql, trans=trans)


def test_sssp_matches_dijkstra(env):
    spark, m, ps = env
    got = {int(r["state"]): r["dist"] for r in sssp(spark, m, ps).collect()}
    ref = static_distances(m, ps)
    sc = _cache(m)
    assert len(got) == len(ref)
    for (tag, door, part), d in ref.items():
        e = sc.edge_by_door_dst[(door, part)]
        assert got[e] == pytest.approx(d, abs=1e-9)
