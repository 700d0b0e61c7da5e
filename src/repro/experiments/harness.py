"""Measurement harness for Tables 3 and 4 (Section 6.1.1, metrics).

For each query instance and each of the six algorithm variants the paper
compares (*PQ, *PQ-G, *PQ-PP, *PQ-NT, *PQ-GTG, *PQ-A), we measure:

* **running time** — wall clock of one query (fresh estimator per query, as
  the paper measures per-query cost);
* **memory** — ``tracemalloc`` peak over a separate identical run (KB); the
  instrumented run is kept apart so tracing overhead never pollutes timing;
* **hit** — whether the returned door sequence equals the gold-standard
  path, "returned by searching over the detailed simulated trajectories"
  (our microsim / trajectory-world populations);
* **relative error** — ``γ = |cost_E − cost_G| / cost_G`` on the query-type
  cost (overall travel time for FPQ, overall contact for LCPQ).
"""
from __future__ import annotations

import time
import tracemalloc
from dataclasses import dataclass

import numpy as np

from repro.core.adaptive import adaptive_search
from repro.core.estimators import (
    GlobalEstimator,
    GoldEstimator,
    LocalEstimator,
    NTEstimator,
    PPEstimator,
)
from repro.core.model import IndoorCrowdModel
from repro.core.search import FPQ, LCPQ, PathResult, search
from repro.gtg.search import gtg_search
from repro.space.queries import QueryInstance

ALGORITHMS = ("", "-G", "-PP", "-NT", "-GTG", "-A")


def run_query(
    model: IndoorCrowdModel,
    gold_table: np.ndarray,
    inst: QueryInstance,
    qt: str,
    alg: str,
) -> PathResult | None:
    """One query with a fresh estimator — the unit the paper measures."""
    if alg == "":
        return search(model, LocalEstimator(model), inst.ps, inst.pt, model_tq(model), qt)
    if alg == "-G":
        return search(model, GlobalEstimator(model), inst.ps, inst.pt, model_tq(model), qt)
    if alg == "-PP":
        return search(model, PPEstimator(model), inst.ps, inst.pt, model_tq(model), qt)
    if alg == "-NT":
        return search(model, NTEstimator(model), inst.ps, inst.pt, model_tq(model), qt)
    if alg == "-GTG":
        return gtg_search(model, GlobalEstimator(model), inst.ps, inst.pt, model_tq(model), qt)
    if alg == "-A":
        return adaptive_search(model, gold_table, inst.ps, inst.pt, model_tq(model), qt)
    raise ValueError(f"unknown algorithm {alg!r}")


def model_tq(model: IndoorCrowdModel) -> float:
    """Query time: the first instant of the tick after the last report."""
    return model.tick_l * model.timeline.ti


def gold_result(
    model: IndoorCrowdModel, gold_table: np.ndarray, inst: QueryInstance, qt: str
) -> PathResult | None:
    """The gold-standard path: exact search over simulated populations."""
    est = GoldEstimator(model, gold_table)
    return search(model, est, inst.ps, inst.pt, model_tq(model), qt)


@dataclass
class QueryMeasure:
    alg: str
    qt: str
    instance: int
    wall_ms: float
    mem_kb: float
    hit: bool
    rel_err: float


def measure_query(
    model: IndoorCrowdModel,
    gold_table: np.ndarray,
    inst: QueryInstance,
    instance_id: int,
    qt: str,
    alg: str,
    gold: PathResult | None = None,
) -> QueryMeasure:
    if gold is None:
        gold = gold_result(model, gold_table, inst, qt)
    t0 = time.perf_counter()
    result = run_query(model, gold_table, inst, qt, alg)
    wall_ms = (time.perf_counter() - t0) * 1000.0
    tracemalloc.start()
    run_query(model, gold_table, inst, qt, alg)
    _, peak = tracemalloc.get_traced_memory()
    tracemalloc.stop()
    if result is None or gold is None:
        return QueryMeasure(alg, qt, instance_id, wall_ms, peak / 1024, False, float("nan"))
    gold_cost = gold.cost(qt)
    rel_err = (
        abs(result.cost(qt) - gold_cost) / gold_cost if gold_cost > 0 else 0.0
    )
    return QueryMeasure(
        alg=alg,
        qt=qt,
        instance=instance_id,
        wall_ms=wall_ms,
        mem_kb=peak / 1024,
        hit=result.doors == gold.doors,
        rel_err=rel_err,
    )


def evaluate(
    model: IndoorCrowdModel,
    gold_table: np.ndarray,
    instances: list[QueryInstance],
    qt: str,
    algs: tuple[str, ...] = ALGORITHMS,
) -> dict[str, dict[str, float]]:
    """Aggregate Table 3/4 rows: per-algorithm means over the instances."""
    rows: dict[str, dict[str, float]] = {}
    golds = [gold_result(model, gold_table, inst, qt) for inst in instances]
    for alg in algs:
        ms = [
            measure_query(model, gold_table, inst, i, qt, alg, gold=golds[i])
            for i, inst in enumerate(instances)
        ]
        ok = [x for x in ms if not np.isnan(x.rel_err)]
        rows[alg] = {
            "running_time_ms": float(np.mean([x.wall_ms for x in ms])),
            "memory_kb": float(np.mean([x.mem_kb for x in ms])),
            "hit_rate_pct": 100.0 * float(np.mean([x.hit for x in ms])),
            "relative_error": float(np.mean([x.rel_err for x in ok])) if ok else float("nan"),
        }
    return rows
