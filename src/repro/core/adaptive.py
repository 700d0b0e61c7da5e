"""*PQ-A: the adaptive re-planning baseline (Section 6.1.1).

"The adaptive method based on [the] indoor crowd model that keeps updating
and recomputing the optimal route at every node until the user gets to the
target."  At each reached node the walker observes the *actual* current
populations (time has passed, counters have reported — we read the gold
simulation table at the current tick), re-plans a full route to the target
with those populations frozen in time, and advances one hop.

Consequences the paper reports, which fall out of this construction:

* results are only locally optimal (the frozen future ignores evolution), so
  the relative error vs. the gold standard is high;
* freshness of the observed populations can beat the exact estimators on
  hit rate for the population-sensitive LCPQ;
* the user cannot know the path before departure; running time (and memory)
  is the *sum over all nodes* of the per-step re-planning cost.
"""
from __future__ import annotations

import numpy as np

from repro.core.model import IndoorCrowdModel
from repro.core.search import FPQ, PathResult, search, segment_cost
from repro.space.geometry import IndoorPoint, euclid


class FrozenEstimator:
    """Populations pinned at one observation tick (no future derivation)."""

    def __init__(self, table: np.ndarray, tick: int):
        self.table = table
        self.tick = min(max(tick, 0), len(table) - 1)

    def population(self, v: int, tick: int) -> float:  # tick ignored: frozen
        return float(self.table[self.tick, v])


def adaptive_search(
    model: IndoorCrowdModel,
    gold_table: np.ndarray,
    ps: IndoorPoint,
    pt: IndoorPoint,
    t_q: float,
    qt: str = FPQ,
    *,
    max_steps: int = 500,
) -> PathResult | None:
    """Walk from ``p_s`` to ``p_t``, re-planning at every reached node."""
    doors: list[int] = []
    partitions: list[int] = [ps.partition]
    dist = time = contact = 0.0
    at_door: tuple[int, int] | None = None  # (door, partition) once walking

    for _ in range(max_steps):
        now_tick = model.timeline.tick(t_q + time)
        est = FrozenEstimator(gold_table, now_tick)
        if at_door is None:
            r = search(model, est, ps, pt, t_q + time, qt)
        else:
            r = search(model, est, None, pt, t_q + time, qt, start_door=at_door)
        if r is None:
            return None
        cur_part = partitions[-1]
        arrival = t_q + time
        if not r.doors:
            # direct segment to p_t inside the current partition
            seg = (
                euclid(ps.coords(), pt.coords())
                if at_door is None
                else model.point_to_door(pt, at_door[0])
            )
            dt, dk = segment_cost(model, est, cur_part, seg, arrival)
            return PathResult(
                doors=tuple(doors),
                partitions=tuple(partitions),
                dist=dist + seg,
                time=time + dt,
                contact=contact + dk,
            )
        nxt_door, nxt_part = r.doors[0], r.partitions[1]
        seg = (
            model.point_to_door(ps, nxt_door)
            if at_door is None
            else model.d2d(cur_part, at_door[0], nxt_door)
        )
        dt, dk = segment_cost(model, est, cur_part, seg, arrival)
        dist += seg
        time += dt
        contact += dk
        doors.append(nxt_door)
        partitions.append(nxt_part)
        at_door = (nxt_door, nxt_part)
    return None
