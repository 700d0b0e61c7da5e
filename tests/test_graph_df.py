"""Spark tests: the crowd model as vertex/edge DataFrames (+ oracle checks)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.dataflow.graph_df import (
    connected_components,
    degrees,
    edges_df,
    vertices_df,
)
from repro.oracle import assert_equivalent
from tests.conftest import make_tiny_space


@pytest.fixture(scope="module")
def dfs(spark, tiny_world):
    m = tiny_world.model
    return m, vertices_df(spark, m), edges_df(spark, m)


def test_vertices_schema_and_count(dfs):
    m, v, _ = dfs
    assert v.count() == m.n_partitions
    assert set(v.columns) == {
        "partition",
        "area",
        "is_q",
        "capacity",
        "stair_len",
        "pop_latest",
    }


def test_edges_schema_and_count(dfs):
    m, _, e = dfs
    assert e.count() == m.n_edges
    assert set(e.columns) == {"src", "dst", "door", "lam", "period"}


def test_vertex_labels_roundtrip(dfs):
    m, v, _ = dfs
    pdf = v.orderBy("partition").toPandas()
    assert np.allclose(pdf["area"], m.area)
    assert np.array_equal(pdf["is_q"], m.is_q)
    assert np.allclose(pdf["pop_latest"], m.pop_l)


def test_edge_labels_roundtrip(dfs):
    m, _, e = dfs
    pdf = e.orderBy("src", "dst", "door").toPandas()
    ref = pd.DataFrame(
        {"src": m.e_src, "dst": m.e_dst, "door": m.e_door}
    ).sort_values(["src", "dst", "door"], ignore_index=True)
    assert np.array_equal(pdf[["src", "dst", "door"]].to_numpy(), ref.to_numpy())


def test_degrees_match_numpy(dfs):
    m, _, e = dfs
    pdf = degrees(e).orderBy("partition").toPandas()
    out_ref = np.bincount(m.e_src, minlength=m.n_partitions)
    in_ref = np.bincount(m.e_dst, minlength=m.n_partitions)
    assert np.array_equal(pdf["out_degree"], out_ref)
    assert np.array_equal(pdf["in_degree"], in_ref)


def test_degrees_oracle(dfs):
    """Spark degree aggregation vs the identical SQL on DuckDB."""
    m, _, e = dfs
    got = degrees(e)
    sql = """
        WITH o AS (SELECT src AS partition, COUNT(*) AS out_degree
                   FROM edges GROUP BY src),
             i AS (SELECT dst AS partition, COUNT(*) AS in_degree
                   FROM edges GROUP BY dst)
        SELECT COALESCE(o.partition, i.partition) AS partition,
               COALESCE(out_degree, 0) AS out_degree,
               COALESCE(in_degree, 0) AS in_degree
        FROM o FULL OUTER JOIN i ON o.partition = i.partition
    """
    assert_equivalent(got, sql, edges=e)


def test_outflow_aggregation_oracle(dfs):
    """Per-source expected-outflow sums (the Alg.1 kernel) vs DuckDB."""
    m, _, e = dfs
    got = (
        e.where((F.lit(4) % F.col("period")) == 0)
        .groupBy(F.col("src").alias("partition"))
        .agg(F.sum("lam").alias("out_exp"))
    )
    sql = """
        SELECT src AS partition, SUM(lam) AS out_exp
        FROM edges WHERE 4 % period = 0 GROUP BY src
    """
    assert_equivalent(got, sql, edges=e)


def test_connected_components_single(spark, dfs):
    m, v, e = dfs
    cc = connected_components(v, e)
    assert cc.select("component").distinct().count() == 1


def test_connected_components_split(spark):
    """Two floors with no stairways form two components."""
    from repro.space.floorplan import build_space

    bs = build_space(
        floors=2,
        parts_per_floor=[9, 9],
        doors_per_floor=[10, 10],
        stairs_per_gap=[0],
        floor_w=90.0,
        floor_h=90.0,
        obj_max=10,
        horizon_ticks=20,
        seed=1,
    )
    m = bs.model
    m.set_snapshot(0, np.zeros(m.n_partitions))
    cc = connected_components(vertices_df(spark, m), edges_df(spark, m))
    pdf = cc.toPandas()
    assert pdf["component"].nunique() == 2
    # components exactly partition the two floors
    comp_of_floor0 = set(pdf[pdf.partition < 9]["component"])
    comp_of_floor1 = set(pdf[pdf.partition >= 9]["component"])
    assert comp_of_floor0.isdisjoint(comp_of_floor1)
