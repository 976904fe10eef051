"""Tests for partition metrics — locality checked against DuckDB."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import metrics
from repro.graphs import generators as gen
from repro.graphs import ops
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def graph(spark):
    pdf = gen.generate_edges(gen.GraphSpec(n=150, avg_degree=8, seed=31))
    sdf = gen.to_spark(spark, pdf)
    return pdf, sdf


def _assign(spark, n, parts):
    return spark.createDataFrame(pd.DataFrame({"id": range(n), "part": parts}))


def test_locality_all_same_part(graph, spark):
    _, sdf = graph
    a = _assign(spark, 150, np.zeros(150, dtype=int))
    assert metrics.edge_locality(sdf, a) == 1.0


def test_locality_alternating_parts_matches_duckdb(graph, spark):
    pdf, sdf = graph
    parts = np.arange(150) % 2
    a = _assign(spark, 150, parts)
    loc = metrics.edge_locality(sdf, a)
    apdf = pd.DataFrame({"id": range(150), "part": parts})
    loc_df = (
        sdf.join(spark.createDataFrame(apdf).select(F.col("id").alias("src"), F.col("part").alias("p_src")), "src")
        .join(spark.createDataFrame(apdf).select(F.col("id").alias("dst"), F.col("part").alias("p_dst")), "dst")
        .agg(F.avg((F.col("p_src") == F.col("p_dst")).cast("double")).alias("loc"))
    )
    assert_equivalent(
        loc_df,
        """
        SELECT avg(CASE WHEN pa.part = pb.part THEN 1.0 ELSE 0.0 END) AS loc
        FROM edges e JOIN assign pa ON e.src = pa.id JOIN assign pb ON e.dst = pb.id
        """,
        edges=pdf,
        assign=apdf,
    )
    import duckdb

    con = duckdb.connect()
    con.register("edges", pdf)
    con.register("assign", apdf)
    want = con.execute(
        "SELECT avg(CASE WHEN pa.part = pb.part THEN 1.0 ELSE 0.0 END) FROM edges e "
        "JOIN assign pa ON e.src=pa.id JOIN assign pb ON e.dst=pb.id"
    ).fetchone()[0]
    con.close()
    assert loc == pytest.approx(want)


def test_locality_incomplete_assignment_raises(graph, spark):
    _, sdf = graph
    a = _assign(spark, 100, np.zeros(100, dtype=int))  # misses vertices 100..149
    with pytest.raises(ValueError, match="cover"):
        metrics.edge_locality(sdf, a)


def test_imbalance_perfect_split(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit",))
    a = _assign(spark, 150, np.arange(150) % 2)
    imb = metrics.imbalance(vt, a, dims=1, k=2)
    assert imb[0] == pytest.approx(0.0, abs=1e-9)


def test_imbalance_skewed_split(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit",))
    parts = (np.arange(150) < 100).astype(int)  # 100 vs 50 vertices
    a = _assign(spark, 150, parts)
    imb = metrics.imbalance(vt, a, dims=1, k=2)
    assert imb[0] == pytest.approx(100 / 75 - 1)


def test_imbalance_counts_empty_parts(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit",))
    a = _assign(spark, 150, np.zeros(150, dtype=int))  # all in part 0 of k=4
    imb = metrics.imbalance(vt, a, dims=1, k=4)
    assert imb[0] == pytest.approx(4.0 - 1.0)


def test_max_imbalance_over_dims(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit", "degree"))
    parts = np.arange(150) % 2
    a = _assign(spark, 150, parts)
    both = metrics.imbalance(vt, a, dims=2, k=2)
    assert metrics.max_imbalance(vt, a, dims=2, k=2) == pytest.approx(max(both))


def test_epsilon_balance_ge_imbalance(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit", "degree"))
    parts = (np.arange(150) < 90).astype(int)
    a = _assign(spark, 150, parts)
    eps = metrics.epsilon_balance(vt, a, dims=2, k=2)
    imb = metrics.max_imbalance(vt, a, dims=2, k=2)
    assert eps >= imb - 1e-9


def test_part_loads_shape(spark, graph):
    _, sdf = graph
    vt = ops.vertex_table(sdf, dims=("unit", "degree"))
    a = _assign(spark, 150, np.arange(150) % 3)
    loads = metrics.part_loads(vt, a, dims=2)
    assert list(loads.columns) == ["part", "w_0", "w_1"]
    assert len(loads) == 3
    assert loads["w_0"].sum() == pytest.approx(150)
