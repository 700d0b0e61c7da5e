"""Tests for the experiment harness (metrics of Tables 3/4)."""
import math

import numpy as np
import pytest

from repro.core.search import FPQ, LCPQ
from repro.experiments.harness import (
    ALGORITHMS,
    evaluate,
    gold_result,
    measure_query,
    model_tq,
    run_query,
)


def test_model_tq_alignment(tiny_world):
    m = tiny_world.model
    assert model_tq(m) == m.tick_l * m.timeline.ti


@pytest.mark.parametrize("alg", ALGORITHMS)
def test_run_query_returns_path(tiny_world, alg):
    inst = tiny_world.instances[0]
    r = run_query(tiny_world.model, tiny_world.gold_pop, inst, FPQ, alg)
    assert r is not None
    assert r.partitions[-1] == inst.pt.partition


def test_unknown_algorithm_rejected(tiny_world):
    with pytest.raises(ValueError, match="unknown algorithm"):
        run_query(tiny_world.model, tiny_world.gold_pop, tiny_world.instances[0], FPQ, "-XX")


def test_measure_query_fields(tiny_world):
    inst = tiny_world.instances[0]
    m = measure_query(tiny_world.model, tiny_world.gold_pop, inst, 0, FPQ, "")
    assert m.wall_ms > 0
    assert m.mem_kb > 0
    assert isinstance(m.hit, bool)
    assert m.rel_err >= 0 and math.isfinite(m.rel_err)


def test_gold_is_its_own_reference(tiny_world):
    """Measuring the gold search against itself: hit, zero error."""
    inst = tiny_world.instances[0]
    gold = gold_result(tiny_world.model, tiny_world.gold_pop, inst, FPQ)
    assert gold is not None
    # exact searches with the gold estimator would reproduce it exactly;
    # here we check γ's definition directly
    gc = gold.cost(FPQ)
    assert abs(gc - gold.cost(FPQ)) / gc == 0.0


@pytest.mark.parametrize("qt", [FPQ, LCPQ])
def test_evaluate_structure(tiny_world, qt):
    rows = evaluate(
        tiny_world.model,
        tiny_world.gold_pop,
        tiny_world.instances[:2],
        qt,
        algs=("", "-NT"),
    )
    assert set(rows) == {"", "-NT"}
    for r in rows.values():
        assert set(r) == {
            "running_time_ms",
            "memory_kb",
            "hit_rate_pct",
            "relative_error",
        }
        assert 0 <= r["hit_rate_pct"] <= 100
        assert r["running_time_ms"] > 0


def test_exact_pair_identical_results(tiny_world):
    """*PQ and *PQ-G must return identical paths and costs (both exact)."""
    for qt in (FPQ, LCPQ):
        for inst in tiny_world.instances:
            a = run_query(tiny_world.model, tiny_world.gold_pop, inst, qt, "")
            b = run_query(tiny_world.model, tiny_world.gold_pop, inst, qt, "-G")
            assert a.doors == b.doors
            assert a.cost(qt) == pytest.approx(b.cost(qt), rel=1e-12)
