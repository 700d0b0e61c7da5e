"""Distributed experiment execution: the query workload fanned out on Spark.

The paper evaluates 100 query instances × 6 algorithm variants × 2 query
types per configuration.  Each (instance, algorithm) measurement is
independent, so the workload maps cleanly onto executors: the world (crowd
model + gold populations + instances) is broadcast once, instances are
distributed with ``applyInPandas``, and the Table-3/4 aggregation is a Spark
SQL ``GROUP BY`` whose correctness is oracle-checked against DuckDB in the
test suite.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.experiments.harness import ALGORITHMS, gold_result, measure_query
from repro.experiments.world import World

_SCHEMA = (
    "alg string, qt string, instance long, wall_ms double, mem_kb double, "
    "hit boolean, rel_err double"
)


def run_batch(
    spark: SparkSession,
    world: World,
    qts: tuple[str, ...] = ("FPQ", "LCPQ"),
    algs: tuple[str, ...] = ALGORITHMS,
    *,
    parallelism: int | None = None,
) -> DataFrame:
    """All per-query measurements as a DataFrame (one row per run)."""
    bc = spark.sparkContext.broadcast(world)
    tasks = pd.DataFrame(
        [
            (i, qt, alg)
            for i in range(len(world.instances))
            for qt in qts
            for alg in algs
        ],
        columns=["instance", "qt", "alg"],
    )
    n_groups = parallelism or spark.sparkContext.defaultParallelism
    tasks["bucket"] = tasks["instance"] % n_groups

    def run_group(pdf: pd.DataFrame) -> pd.DataFrame:
        w: World = bc.value
        model, gold_pop = w.model, w.gold_pop
        golds: dict[tuple[int, str], object] = {}
        rows = []
        for inst_id, qt, alg in zip(pdf["instance"], pdf["qt"], pdf["alg"]):
            inst = w.instances[int(inst_id)]
            gk = (int(inst_id), qt)
            if gk not in golds:
                golds[gk] = gold_result(model, gold_pop, inst, qt)
            m = measure_query(
                model, gold_pop, inst, int(inst_id), qt, alg, gold=golds[gk]
            )
            rows.append(
                (m.alg, m.qt, m.instance, m.wall_ms, m.mem_kb, m.hit, m.rel_err)
            )
        return pd.DataFrame(
            rows,
            columns=[
                "alg",
                "qt",
                "instance",
                "wall_ms",
                "mem_kb",
                "hit",
                "rel_err",
            ],
        )

    sdf = spark.createDataFrame(tasks)
    return (
        sdf.repartition(n_groups, "bucket")
        .groupBy("bucket")
        .applyInPandas(lambda pdf: run_group(pdf), schema=_SCHEMA)
    )


def aggregate_table(measures: DataFrame) -> DataFrame:
    """Table 3/4 rows: per (qt, alg) averages over instances (Spark SQL)."""
    return (
        measures.groupBy("qt", "alg")
        .agg(
            F.avg("wall_ms").alias("running_time_ms"),
            F.avg("mem_kb").alias("memory_kb"),
            (F.avg(F.col("hit").cast("double")) * 100.0).alias("hit_rate_pct"),
            # NaN marks a query with no result (e.g. A hitting its step
            # guard); exclude it instead of poisoning the mean
            F.avg(
                F.when(~F.isnan("rel_err"), F.col("rel_err"))
            ).alias("relative_error"),
        )
        .orderBy("qt", "alg")
    )
