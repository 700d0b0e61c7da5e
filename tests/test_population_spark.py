"""Spark tests: Algorithm 1 as DataFrame supersteps vs the NumPy kernel."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.estimators import GlobalEstimator
from repro.dataflow.graph_df import edges_df
from repro.dataflow.population_spark import population_global_spark
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def spark_pops(spark, tiny_world):
    m = tiny_world.model
    end = m.tick_l + 12
    df = population_global_spark(spark, m, end)
    return m, end, df


def test_covers_all_ticks_and_partitions(spark_pops):
    m, end, df = spark_pops
    n_ticks = end - m.tick_l + 1
    assert df.count() == n_ticks * m.n_partitions


def test_equals_numpy_global(spark_pops):
    m, end, df = spark_pops
    pdf = df.toPandas().pivot(index="tick", columns="partition", values="pop")
    est = GlobalEstimator(m)
    est.ensure(end)
    ref = np.array(est.pops)
    assert np.allclose(pdf.sort_index().to_numpy(), ref, atol=1e-9)


def test_population_conserved_per_tick(spark_pops):
    m, _, df = spark_pops
    totals = (
        df.groupBy("tick").agg(F.sum("pop").alias("total")).toPandas()["total"]
    )
    assert np.allclose(totals, m.pop_l.sum(), atol=1e-6)


def test_populations_nonnegative(spark_pops):
    _, _, df = spark_pops
    assert df.where(F.col("pop") < -1e-9).count() == 0


def test_initial_tick_is_snapshot(spark_pops):
    m, _, df = spark_pops
    first = (
        df.where(F.col("tick") == m.tick_l)
        .orderBy("partition")
        .toPandas()["pop"]
        .to_numpy()
    )
    assert np.allclose(first, m.pop_l)


def test_single_superstep_oracle(spark, tiny_world):
    """One rectified superstep expressed in SQL on DuckDB must agree."""
    m = tiny_world.model
    x = m.tick_l + 1
    df = population_global_spark(spark, m, x).where(F.col("tick") == x).select(
        "partition", "pop"
    )
    import pandas as pd

    pops0 = pd.DataFrame(
        {"partition": range(m.n_partitions), "pop": m.pop_l}
    )
    edges = edges_df(spark, m)
    sql = f"""
        WITH act AS (
            SELECT src, dst, lam FROM edges WHERE {x} % period = 0
        ),
        outs AS (
            SELECT src, SUM(lam) AS out_exp FROM act GROUP BY src
        ),
        scaled AS (
            SELECT p.partition, p.pop,
                   COALESCE(o.out_exp, 0) AS out_exp,
                   CASE WHEN COALESCE(o.out_exp, 0) > p.pop
                        THEN p.pop / o.out_exp ELSE 1.0 END AS scale
            FROM pops0 p LEFT JOIN outs o ON p.partition = o.src
        ),
        inflow AS (
            SELECT a.dst AS partition, SUM(a.lam * s.scale) AS inflow
            FROM act a JOIN scaled s ON a.src = s.partition
            GROUP BY a.dst
        )
        SELECT s.partition,
               s.pop - LEAST(s.out_exp, s.pop) + COALESCE(i.inflow, 0) AS pop
        FROM scaled s LEFT JOIN inflow i ON s.partition = i.partition
    """
    assert_equivalent(df, sql, edges=edges, pops0=pops0)


def test_requires_snapshot(spark):
    from tests.conftest import make_tiny_space

    bs = make_tiny_space()
    with pytest.raises(ValueError, match="snapshot"):
        population_global_spark(spark, bs.model, 5)


def test_tick_end_validation(spark, tiny_world):
    with pytest.raises(ValueError, match="before the latest"):
        population_global_spark(spark, tiny_world.model, tiny_world.model.tick_l - 1)
