"""Static indoor SSSP as iterative DataFrame edge relaxation.

The crowd-free walking metric (Eq. 1 door-to-door distances) underlies both
the ``s2t``-controlled workload generator and the tie-breaking "shortest"
clauses of FPQ/LCPQ.  This job computes it GraphX-style: states are directed
edges of the crowd model ("door d entered partition v"), transitions connect
a state to every leaveable door of its partition, and Bellman-Ford rounds
(join → min-aggregate) run until a fixpoint.  The driver Dijkstra
(``repro.core.search.static_distances``) is the reference oracle.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.model import IndoorCrowdModel
from repro.space.geometry import IndoorPoint


def state_transitions(spark: SparkSession, model: IndoorCrowdModel) -> DataFrame:
    """Transition relation ``(state, next_state, weight)`` over edge states."""
    rows = []
    for e in range(model.n_edges):
        v = int(model.e_dst[e])
        d_in = int(model.e_door[e])
        for e2 in model.out_edges[v]:
            d_out = int(model.e_door[e2])
            rows.append((e, int(e2), model.d2d(v, d_in, d_out)))
    pdf = pd.DataFrame(rows, columns=["state", "next_state", "weight"])
    return spark.createDataFrame(pdf)


def sssp(
    spark: SparkSession,
    model: IndoorCrowdModel,
    ps: IndoorPoint,
    *,
    max_iter: int = 200,
) -> DataFrame:
    """Distances from ``p_s`` to every reachable edge state.

    Returns ``(state, dist)``; a state is the directed-edge id of "door
    crossed into partition", matching ``static_distances`` keys.
    """
    trans = state_transitions(spark, model).localCheckpoint(eager=True)
    init_rows = [
        (int(e), model.point_to_door(ps, int(model.e_door[e])))
        for e in model.out_edges[ps.partition]
    ]
    dist = spark.createDataFrame(
        pd.DataFrame(init_rows, columns=["state", "dist"])
    ).localCheckpoint(eager=True)
    for _ in range(max_iter):
        relaxed = (
            trans.join(dist, "state")
            .select(
                F.col("next_state").alias("state"),
                (F.col("dist") + F.col("weight")).alias("dist"),
            )
        )
        new_dist = (
            dist.unionByName(relaxed)
            .groupBy("state")
            .agg(F.min("dist").alias("dist"))
            .localCheckpoint(eager=True)
        )
        # fixpoint: same states, no distance improved
        if new_dist.count() == dist.count():
            improved = (
                new_dist.alias("n")
                .join(dist.alias("o"), "state")
                .where(F.col("n.dist") < F.col("o.dist") - 1e-9)
                .limit(1)
                .count()
            )
            if improved == 0:
                return new_dist
        dist = new_dist
    return dist
