"""Probabilistic door-flow counting from raw trajectories (Section 6.2).

The paper recovers door flows from positioning data where "nearly 12% of two
consecutive locations are not topologically-connected":

1. pair consecutive fixes per device (window function);
2. a topologically-connected pair contributes flow 1 to the connecting
   door(s) (split uniformly if several doors connect the two partitions);
3. a gap pair gets a set Φ of valid sub-paths; those longer than twice the
   shortest are discarded; sub-path φ_i is taken with probability
   ``P(φ_i) = (1/len(φ_i)) / Σ_k 1/len(φ_k)``, and every door on φ_i
   receives P(φ_i);
4. door flows are sampled per 10 s bucket; λ per directed edge is the mean
   flow per report interval, corrected by the tracked-device penetration
   (the positioning system only sees objects during their tracking session).

Steps 1 and 4 are pure DataFrame work; step 3 runs in ``applyInPandas``
workers over the distinct gap pairs with the (broadcast) model.
"""
from __future__ import annotations

import math
from collections import defaultdict

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.model import IndoorCrowdModel


def consecutive_pairs(fixes: DataFrame) -> DataFrame:
    """(mac, t0, v0, t1, v1) for each pair of consecutive fixes per device."""
    w = Window.partitionBy("mac").orderBy("t")
    return (
        fixes.select(
            "mac",
            F.lag("t").over(w).alias("t0"),
            F.lag("partition").over(w).alias("v0"),
            F.col("t").alias("t1"),
            F.col("partition").alias("v1"),
        )
        .where(F.col("t0").isNotNull())
        .where(F.col("v0") != F.col("v1"))
    )


def _partition_adjacency(model: IndoorCrowdModel) -> dict[tuple[int, int], list[int]]:
    """(src, dst) -> directed-edge ids connecting them."""
    adj: dict[tuple[int, int], list[int]] = defaultdict(list)
    for e in range(model.n_edges):
        adj[(int(model.e_src[e]), int(model.e_dst[e]))].append(e)
    return dict(adj)


def subpath_edge_weights(
    model: IndoorCrowdModel, v0: int, v1: int, *, max_extra_hops: int = 3
) -> list[tuple[int, float]]:
    """Step 3 for one gap pair: ``[(edge_id, probability-weight)]``.

    Valid sub-paths are simple partition sequences from ``v0`` to ``v1``;
    their length is the sum of segment distances through the cheapest
    connecting doors.  Paths longer than twice the shortest are excluded;
    the remainder get 1/length-normalized probabilities and every directed
    edge on a path receives that path's probability.
    """
    adj = _adjacency_cache(model)
    nbrs = _neighbor_cache(model)
    # shortest hop count via BFS (bounds the DFS depth)
    hops = {v0: 0}
    frontier = [v0]
    while frontier and v1 not in hops:
        nxt = []
        for u in frontier:
            for wv in nbrs[u]:
                if wv not in hops:
                    hops[wv] = hops[u] + 1
                    nxt.append(wv)
        frontier = nxt
    if v1 not in hops:
        return []
    max_hops = hops[v1] + max_extra_hops

    paths: list[tuple[list[int], float]] = []  # (edge ids, length)

    def seg(u: int, w: int) -> tuple[int, float]:
        """Cheapest connecting edge and a representative segment length."""
        best_e, best_len = None, math.inf
        for e in adj[(u, w)]:
            d = int(model.e_door[e])
            length = float(
                np.linalg.norm(model.door_xyz[d] - _centroid(model, u))
            ) + float(np.linalg.norm(model.door_xyz[d] - _centroid(model, w)))
            if length < best_len:
                best_e, best_len = e, length
        return best_e, best_len

    def dfs(u: int, edges: list[int], length: float, seen: set[int]) -> None:
        if u == v1:
            paths.append((edges.copy(), max(length, 1.0)))
            return
        if len(edges) >= max_hops:
            return
        for wv in nbrs[u]:
            if wv in seen or (u, wv) not in adj:
                continue
            e, slen = seg(u, wv)
            seen.add(wv)
            edges.append(e)
            dfs(wv, edges, length + slen, seen)
            edges.pop()
            seen.remove(wv)

    dfs(v0, [], 0.0, {v0})
    if not paths:
        return []
    shortest = min(length for _, length in paths)
    kept = [(es, length) for es, length in paths if length <= 2.0 * shortest]
    norm = sum(1.0 / length for _, length in kept)
    out: list[tuple[int, float]] = []
    for es, length in kept:
        p = (1.0 / length) / norm
        out.extend((e, p) for e in es)
    return out


def _adjacency_cache(model: IndoorCrowdModel):
    got = getattr(model, "_adj_cache", None)
    if got is None:
        got = _partition_adjacency(model)
        model._adj_cache = got
    return got


def _neighbor_cache(model: IndoorCrowdModel):
    got = getattr(model, "_nbr_cache", None)
    if got is None:
        got = [
            sorted({int(model.e_dst[e]) for e in model.out_edges[v]})
            for v in range(model.n_partitions)
        ]
        model._nbr_cache = got
    return got


def _centroid(model: IndoorCrowdModel, v: int) -> np.ndarray:
    doors = model.partition_doors(v)
    return model.door_xyz[doors].mean(axis=0)


def resolve_pairs(model: IndoorCrowdModel, pdf: pd.DataFrame) -> pd.DataFrame:
    """Steps 2–3 for a batch of consecutive pairs → (edge, bucket, flow)."""
    adj = _adjacency_cache(model)
    memo: dict[tuple[int, int], list[tuple[int, float]]] = {}
    rows = []
    for v0, v1, bucket in zip(pdf["v0"], pdf["v1"], pdf["bucket"]):
        key = (int(v0), int(v1))
        if key in adj:  # topologically connected: split over doors
            edges = adj[key]
            for e in edges:
                rows.append((int(e), int(bucket), 1.0 / len(edges)))
            continue
        w = memo.get(key)
        if w is None:
            w = subpath_edge_weights(model, *key)
            memo[key] = w
        for e, p in w:
            rows.append((int(e), int(bucket), float(p)))
    return pd.DataFrame(rows, columns=["edge", "bucket", "flow"])


def count_door_flows(
    spark: SparkSession,
    model: IndoorCrowdModel,
    fixes: DataFrame,
    *,
    bucket_s: float = 10.0,
) -> DataFrame:
    """Per-(edge, bucket) probabilistic flows: ``(edge, bucket, flow)``."""
    pairs = consecutive_pairs(fixes).withColumn(
        "bucket", F.floor(F.col("t1") / F.lit(bucket_s)).cast("long")
    )
    bc_model = spark.sparkContext.broadcast(model)

    def resolve(pdf: pd.DataFrame) -> pd.DataFrame:
        return resolve_pairs(bc_model.value, pdf)

    per_pair = pairs.repartition(16, "v0").groupBy("v0").applyInPandas(
        lambda pdf: resolve(pdf), schema="edge long, bucket long, flow double"
    )
    return per_pair.groupBy("edge", "bucket").agg(F.sum("flow").alias("flow"))


def count_door_flows_pandas(
    model: IndoorCrowdModel, fixes: pd.DataFrame, *, bucket_s: float = 10.0
) -> pd.DataFrame:
    """Single-machine reference of ``count_door_flows`` (oracle for tests)."""
    df = fixes.sort_values(["mac", "t"])
    pairs = pd.DataFrame(
        {
            "mac": df["mac"],
            "t0": df.groupby("mac")["t"].shift(1),
            "v0": df.groupby("mac")["partition"].shift(1),
            "t1": df["t"],
            "v1": df["partition"],
        }
    ).dropna(subset=["t0"])
    pairs = pairs[pairs["v0"] != pairs["v1"]]
    pairs["bucket"] = (pairs["t1"] // bucket_s).astype(np.int64)
    rows = resolve_pairs(model, pairs)
    return (
        rows.groupby(["edge", "bucket"], as_index=False)["flow"]
        .sum()
        .sort_values(["edge", "bucket"], ignore_index=True)
    )


def fit_edge_lambdas(
    flows: DataFrame,
    model: IndoorCrowdModel,
    *,
    n_buckets: int,
    penetration: float = 1.0,
) -> np.ndarray:
    """λ per directed edge: mean flow per report bucket / penetration.

    ``penetration`` is the fraction of door crossings the positioning system
    observes (tracked-session coverage × per-fix retention²), a deployment
    constant of the localization system, not an oracle quantity.
    """
    pdf = flows.groupBy("edge").agg(F.sum("flow").alias("total")).toPandas()
    lam = np.zeros(model.n_edges)
    if len(pdf):
        lam[pdf["edge"].to_numpy()] = pdf["total"].to_numpy()
    lam /= max(n_buckets, 1) * max(penetration, 1e-9)
    return lam
