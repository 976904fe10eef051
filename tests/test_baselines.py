"""Tests for the four baseline partitioners (paper §4)."""
import numpy as np
import pandas as pd
import pytest

from repro import metrics
from repro.baselines.blp import blp_partition
from repro.baselines.hash_part import hash_partition
from repro.baselines.shp import shp_partition
from repro.baselines.spinner import spinner_partition
from repro.graphs import generators as gen
from repro.graphs.ops import vertex_table


@pytest.fixture(scope="module")
def graph(spark):
    spec = gen.GraphSpec(n=300, avg_degree=10, levels=2, mu_cross=0.15, seed=70)
    pdf = gen.generate_edges(spec)
    sdf = gen.to_spark(spark, pdf).cache()
    vt = vertex_table(sdf).cache()
    vt.count()
    return spec, sdf, vt


# ------------------------------------------------------------------- hash


@pytest.mark.parametrize("k", [2, 4, 8])
def test_hash_covers_all_parts(graph, k):
    _, sdf, vt = graph
    a = hash_partition(vt, k)
    parts = {r["part"] for r in a.select("part").distinct().collect()}
    assert parts == set(range(k))


def test_hash_near_balanced(graph):
    _, sdf, vt = graph
    a = hash_partition(vt, 2)
    assert metrics.max_imbalance(vt, a, dims=2, k=2) < 0.25


def test_hash_locality_near_1_over_k(graph):
    _, sdf, vt = graph
    for k in (2, 4):
        a = hash_partition(vt, k)
        loc = metrics.edge_locality(sdf, a)
        assert loc == pytest.approx(1.0 / k, abs=0.08)


def test_hash_deterministic(graph):
    _, _, vt = graph
    a = hash_partition(vt, 4, seed=1).toPandas().sort_values("id")
    b = hash_partition(vt, 4, seed=1).toPandas().sort_values("id")
    pd.testing.assert_frame_equal(a.reset_index(drop=True), b.reset_index(drop=True))


def test_hash_seed_changes_assignment(graph):
    _, _, vt = graph
    a = hash_partition(vt, 4, seed=1).toPandas().sort_values("id")
    b = hash_partition(vt, 4, seed=2).toPandas().sort_values("id")
    assert not a["part"].to_numpy().tolist() == b["part"].to_numpy().tolist()


# ------------------------------------------------------------------ spinner


def test_spinner_total_assignment(graph):
    spec, sdf, _ = graph
    a = spinner_partition(sdf, k=2, n_rounds=3)
    assert a.count() == spec.n
    assert a.select("id").distinct().count() == spec.n


def test_spinner_improves_locality_over_hash(graph):
    _, sdf, vt = graph
    a = spinner_partition(sdf, k=2, n_rounds=5, seed=3)
    loc_spinner = metrics.edge_locality(sdf, a)
    loc_hash = metrics.edge_locality(sdf, hash_partition(vt, 2))
    assert loc_spinner > loc_hash


def test_spinner_rough_degree_balance(graph):
    """Spinner's own objective (degree load) should be roughly held."""
    _, sdf, vt = graph
    a = spinner_partition(sdf, k=2, n_rounds=6, seed=4)
    imb = metrics.imbalance(vt, a, dims=2, k=2)
    assert imb[1] < 0.5  # degree dimension: loose but bounded


def test_spinner_parts_in_range(graph):
    _, sdf, _ = graph
    a = spinner_partition(sdf, k=4, n_rounds=3)
    parts = {r["part"] for r in a.select("part").distinct().collect()}
    assert parts <= set(range(4))


# --------------------------------------------------------------------- blp


@pytest.mark.parametrize("merge", ["greedy", "random"])
def test_blp_total_assignment(graph, merge):
    spec, sdf, _ = graph
    a = blp_partition(sdf, k=2, c=8, n_rounds=3, merge=merge, seed=5)
    assert a.count() == spec.n


def test_blp_near_balanced_both_dims(graph):
    """Fig 4: BLP produces nearly-balanced (ε < ~0.05-0.1) solutions."""
    _, sdf, vt = graph
    a = blp_partition(sdf, k=2, c=16, n_rounds=5, seed=6)
    imb = metrics.imbalance(vt, a, dims=2, k=2)
    assert max(imb) < 0.12


def test_blp_improves_locality_over_hash(graph):
    _, sdf, vt = graph
    a = blp_partition(sdf, k=2, c=16, n_rounds=6, seed=7)
    assert metrics.edge_locality(sdf, a) > metrics.edge_locality(
        sdf, hash_partition(vt, 2)
    )


def test_blp_parts_range(graph):
    _, sdf, _ = graph
    a = blp_partition(sdf, k=4, c=8, n_rounds=3, seed=8)
    parts = {r["part"] for r in a.select("part").distinct().collect()}
    assert parts <= set(range(4))


# --------------------------------------------------------------------- shp


def test_shp_total_assignment(graph):
    spec, sdf, _ = graph
    a = shp_partition(sdf, k=2, n_rounds=3, seed=9)
    assert a.count() == spec.n


def test_shp_improves_locality_over_hash(graph):
    _, sdf, vt = graph
    a = shp_partition(sdf, k=2, n_rounds=6, seed=10)
    assert metrics.edge_locality(sdf, a) > metrics.edge_locality(
        sdf, hash_partition(vt, 2)
    )


def test_shp_combined_dimension_roughly_balanced(graph):
    """SHP holds its own combined dimension, not the individual ones."""
    _, sdf, vt = graph
    a = shp_partition(sdf, k=2, n_rounds=6, vertex_coeff=0.5, seed=11)
    loads = metrics.part_loads(vt, a, dims=2)
    avg_deg = float(vt.toPandas()["degree"].mean())
    comb = loads["w_1"] + 0.5 * avg_deg * loads["w_0"]
    assert comb.max() / comb.mean() - 1 < 0.3


def test_shp_parts_range(graph):
    _, sdf, _ = graph
    a = shp_partition(sdf, k=4, n_rounds=3, seed=12)
    parts = {r["part"] for r in a.select("part").distinct().collect()}
    assert parts <= set(range(4))


# ---------------------------------------------------- Fig 4 qualitative shape


def test_fig4_shape_on_skewed_graph(spark):
    """On a skewed (Twitter-like) graph: Hash stays near-balanced on both
    dimensions while Spinner/SHP show materially worse vertex balance —
    the paper's core multi-dimensional argument (Fig 4)."""
    spec = gen.twitter_lite(n=600)
    sdf = gen.to_spark(spark, gen.generate_edges(spec)).cache()
    vt = vertex_table(sdf).cache()
    k = 2
    hash_v = metrics.imbalance(vt, hash_partition(vt, k), dims=2, k=k)[0]
    spin_v = metrics.imbalance(vt, spinner_partition(sdf, k, n_rounds=6, seed=1), dims=2, k=k)[0]
    shp_v = metrics.imbalance(vt, shp_partition(sdf, k, n_rounds=6, seed=1), dims=2, k=k)[0]
    assert hash_v < 0.15
    assert max(spin_v, shp_v) > hash_v
