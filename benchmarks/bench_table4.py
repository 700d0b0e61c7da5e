"""Benchmarks regenerating Table 4's running-time column ("real" mall data).

Same algorithm × query-type grid as Table 3, over the full simulated
Hangzhou mall (977 partitions / 1613 doors, trajectory-fitted flows).
"""
import pytest

from repro.core.search import FPQ, LCPQ
from repro.experiments.harness import ALGORITHMS, run_query

CASES = [(qt, alg) for qt in (FPQ, LCPQ) for alg in ALGORITHMS]
IDS = [f"{qt}{alg}" for qt, alg in CASES]


@pytest.mark.parametrize("qt,alg", CASES, ids=IDS)
def test_table4_query(benchmark, table4_world, qt, alg):
    w = table4_world
    inst = w.instances[0]
    benchmark.pedantic(
        run_query,
        args=(w.model, w.gold_pop, inst, qt, alg),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
