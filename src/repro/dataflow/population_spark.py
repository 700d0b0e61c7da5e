"""Algorithm 1 (global population estimator) as Spark DataFrame supersteps.

Each update tick is one aggregate-messages round — the same dataflow GraphX
Pregel would run:

1. *activate*: keep edges whose door reports at this tick (``tick % period
   == 0``) carrying their expected flow λ;
2. *aggregate out*: per-source sum of expected outflows;
3. *rectify* (Figure 4): scale factor ``min(1, pop/out)`` per source,
   applied to every outgoing flow;
4. *aggregate in*: per-destination sum of rectified inflows;
5. *merge* (Eq. 6): ``pop' = pop − min(out, pop) + in``.

The driver loop over ticks is deterministic control flow; all per-tick work
is Catalyst-planned DataFrame computation.  ``localCheckpoint`` keeps the
lineage flat so hundreds of supersteps do not blow up the plan.

The NumPy ``GlobalEstimator`` is the single-machine kernel of the same
recurrence; tests assert equality superstep by superstep.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.model import IndoorCrowdModel
from repro.dataflow.graph_df import edges_df, vertices_df


def population_global_spark(
    spark: SparkSession,
    model: IndoorCrowdModel,
    tick_end: int,
    *,
    checkpoint_every: int = 8,
) -> DataFrame:
    """Derive all partitions' populations from ``t_l`` up to ``tick_end``.

    Returns a DataFrame ``(tick, partition, pop)`` covering every tick in
    ``[tick_l, tick_end]`` — the populations Algorithm 1 adds to ``G``.
    """
    if model.pop_l is None:
        raise ValueError("model snapshot not installed")
    if tick_end < model.tick_l:
        raise ValueError("tick_end before the latest update tick")
    edges = edges_df(spark, model).select("src", "dst", "lam", "period")
    edges = edges.localCheckpoint(eager=True)
    pops = (
        vertices_df(spark, model)
        .select("partition", F.col("pop_latest").alias("pop"))
        .localCheckpoint(eager=True)
    )
    out_frames = [pops.select(F.lit(model.tick_l).alias("tick"), "partition", "pop")]
    for x in range(model.tick_l + 1, tick_end + 1):
        act = edges.where((F.lit(x) % F.col("period")) == 0)
        out_exp = act.groupBy(F.col("src").alias("partition")).agg(
            F.sum("lam").alias("out_exp")
        )
        with_out = pops.join(out_exp, "partition", "left_outer").select(
            "partition",
            "pop",
            F.coalesce("out_exp", F.lit(0.0)).alias("out_exp"),
        )
        scaled = with_out.withColumn(
            "scale",
            F.when(
                F.col("out_exp") > F.col("pop"),
                F.col("pop") / F.col("out_exp"),
            ).otherwise(F.lit(1.0)),
        )
        inflow = (
            act.join(
                scaled.select(F.col("partition").alias("src"), "scale"), "src"
            )
            .groupBy(F.col("dst").alias("partition"))
            .agg(F.sum(F.col("lam") * F.col("scale")).alias("inflow"))
        )
        pops = (
            scaled.join(inflow, "partition", "left_outer")
            .select(
                "partition",
                (
                    F.col("pop")
                    - F.least("out_exp", "pop")
                    + F.coalesce("inflow", F.lit(0.0))
                ).alias("pop"),
            )
        )
        if (x - model.tick_l) % checkpoint_every == 0 or x == tick_end:
            pops = pops.localCheckpoint(eager=True)
        out_frames.append(
            pops.select(F.lit(x).alias("tick"), "partition", "pop")
        )
    result = out_frames[0]
    for f in out_frames[1:]:
        result = result.unionByName(f)
    return result
