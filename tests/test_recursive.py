"""Tests for recursive k-way partitioning (§3.3)."""
import numpy as np
import pandas as pd
import pytest

from repro import metrics
from repro.core.params import GDParams
from repro.core.recursive import partition_k_local, partition_k_spark
from repro.graphs import generators as gen
from repro.graphs.ops import vertex_table
from tests.test_local_gd import _weights


@pytest.fixture(scope="module")
def graph4():
    """Four planted communities (levels=2)."""
    spec = gen.GraphSpec(n=400, avg_degree=12, levels=2, mu_cross=0.1, seed=60)
    return spec, gen.generate_edges(spec)


def test_local_k4_parts_range(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    parts = partition_k_local(edges, W, 4, GDParams(n_iter=40, eps=0.08, seed=0))
    assert set(np.unique(parts)) == {0, 1, 2, 3}


def test_local_k4_balance(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    eps = 0.08
    parts = partition_k_local(edges, W, 4, GDParams(n_iter=40, eps=eps, seed=0))
    for j in range(W.shape[1]):
        loads = np.array([W[parts == p, j].sum() for p in range(4)])
        target = W[:, j].sum() / 4
        assert np.abs(loads - target).max() <= (eps + 0.02) * target * 2


def test_local_k4_beats_hash_locality(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    parts = partition_k_local(edges, W, 4, GDParams(n_iter=40, eps=0.08, seed=0))
    s, d = edges.src.to_numpy(), edges.dst.to_numpy()
    loc = float(np.mean(parts[s] == parts[d]))
    assert loc > 0.5  # hash gives ~0.25


def test_local_k1_trivial(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    parts = partition_k_local(edges, W, 1, GDParams(n_iter=2))
    assert (parts == 0).all()


def test_local_k_must_be_power_of_two(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    with pytest.raises(AssertionError, match="power of two"):
        partition_k_local(edges, W, 3, GDParams(n_iter=2))


def test_local_k_deterministic(graph4):
    spec, edges = graph4
    W = _weights(edges, spec.n)
    p = GDParams(n_iter=15, seed=5)
    a = partition_k_local(edges, W, 4, p)
    b = partition_k_local(edges, W, 4, p)
    assert np.array_equal(a, b)


def test_spark_k4_local_fallback(graph4, spark):
    """spark_levels=0 collects and runs the numpy recursion."""
    spec, edges = graph4
    sdf = gen.to_spark(spark, edges)
    vt = vertex_table(sdf)
    assign = partition_k_spark(sdf, vt, 4, GDParams(n_iter=30, eps=0.08, seed=0), spark_levels=0)
    assert assign.count() == spec.n
    assert metrics.edge_locality(sdf, assign) > 0.45
    assert metrics.epsilon_balance(vt, assign, dims=2, k=4) < 0.25


def test_spark_k4_top_level_distributed(graph4, spark):
    """spark_levels=1: top bisection on Spark, halves finished locally."""
    spec, edges = graph4
    sdf = gen.to_spark(spark, edges).cache()
    vt = vertex_table(sdf).cache()
    assign = partition_k_spark(sdf, vt, 4, GDParams(n_iter=12, eps=0.08, seed=1), spark_levels=1)
    parts = assign.toPandas().sort_values("id")["part"].to_numpy()
    assert assign.count() == spec.n
    assert set(np.unique(parts)) == {0, 1, 2, 3}


def test_spark_k2_equals_bipartition_shape(graph4, spark):
    spec, edges = graph4
    sdf = gen.to_spark(spark, edges)
    vt = vertex_table(sdf)
    assign = partition_k_spark(sdf, vt, 2, GDParams(n_iter=10, eps=0.05, seed=2), spark_levels=1)
    assert set(r["part"] for r in assign.select("part").distinct().collect()) == {0, 1}
