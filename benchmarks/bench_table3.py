"""Benchmarks regenerating Table 3's running-time column (synthetic data).

One benchmark per algorithm column × query type, on the Table-2 default
world.  ``pytest benchmarks/ --benchmark-only`` prints the per-query wall
times whose ordering Table 3 reports (NT < PP/A < exact < GTG).
"""
import pytest

from repro.core.search import FPQ, LCPQ
from repro.experiments.harness import ALGORITHMS, run_query

CASES = [(qt, alg) for qt in (FPQ, LCPQ) for alg in ALGORITHMS]
IDS = [f"{qt}{alg}" for qt, alg in CASES]


@pytest.mark.parametrize("qt,alg", CASES, ids=IDS)
def test_table3_query(benchmark, table3_world, qt, alg):
    w = table3_world
    inst = w.instances[0]
    benchmark.pedantic(
        run_query,
        args=(w.model, w.gold_pop, inst, qt, alg),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
