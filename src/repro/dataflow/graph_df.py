"""The indoor crowd model as Spark vertex/edge DataFrames.

GraphX itself is JVM-only (and GraphFrames would need ``--packages``), so the
graph layer is realized in the DataFrame API with the same building blocks
GraphX offers: a vertices relation, an edges relation, degree aggregation,
and Pregel-style iterative message passing (join → aggregate → update).

Schemas
-------
vertices: partition INT, area DOUBLE, is_q BOOLEAN, capacity DOUBLE,
          stair_len DOUBLE, pop_latest DOUBLE
edges:    src INT, dst INT, door INT, lam DOUBLE, period INT
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.model import IndoorCrowdModel


def vertices_df(spark: SparkSession, model: IndoorCrowdModel) -> DataFrame:
    """One row per partition with its L_V label fields."""
    pop = model.pop_l if model.pop_l is not None else [0.0] * model.n_partitions
    pdf = pd.DataFrame(
        {
            "partition": range(model.n_partitions),
            "area": model.area,
            "is_q": model.is_q,
            "capacity": model.cap,
            "stair_len": model.stair_len,
            "pop_latest": pop,
        }
    )
    return spark.createDataFrame(pdf)


def edges_df(spark: SparkSession, model: IndoorCrowdModel) -> DataFrame:
    """One row per directed edge ``(v_i, v_j, d_k)`` with its L_E label."""
    pdf = pd.DataFrame(
        {
            "src": model.e_src,
            "dst": model.e_dst,
            "door": model.e_door,
            "lam": model.e_lam,
            "period": model.door_period[model.e_door],
        }
    )
    return spark.createDataFrame(pdf)


def degrees(edges: DataFrame) -> DataFrame:
    """GraphX-style degrees: out/in directed-edge counts per partition."""
    out = edges.groupBy(F.col("src").alias("partition")).agg(
        F.count("*").alias("out_degree")
    )
    inn = edges.groupBy(F.col("dst").alias("partition")).agg(
        F.count("*").alias("in_degree")
    )
    return (
        out.join(inn, "partition", "full_outer")
        .fillna(0)
        .select(
            "partition",
            F.col("out_degree").cast("long"),
            F.col("in_degree").cast("long"),
        )
    )


def connected_components(
    vertices: DataFrame, edges: DataFrame, *, max_iter: int = 64
) -> DataFrame:
    """Min-label propagation — the GraphX connected-components algorithm.

    Treats edges as undirected (door connectivity).  Each superstep joins
    the current labels onto the edge list, takes the per-vertex minimum of
    neighbour labels, and stops when no label changed.  Returns
    ``(partition, component)``.
    """
    labels = vertices.select(
        "partition", F.col("partition").alias("component")
    )
    sym = (
        edges.select("src", "dst")
        .union(edges.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
        .distinct()
    )
    sym = sym.localCheckpoint(eager=True)
    for _ in range(max_iter):
        msgs = (
            sym.join(labels, sym.src == labels.partition)
            .groupBy(F.col("dst").alias("partition"))
            .agg(F.min("component").alias("nbr_min"))
        )
        new_labels = (
            labels.join(msgs, "partition", "left_outer")
            .select(
                "partition",
                F.least(
                    F.col("component"), F.coalesce("nbr_min", F.col("component"))
                ).alias("component"),
            )
        )
        # checkpoint to keep the lineage flat across supersteps
        new_labels = new_labels.localCheckpoint(eager=True)
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "partition")
            .where(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    return labels
