"""Tests for the DC-hSBM social-graph generators (DESIGN.md §4 substitution)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs import generators as gen
from repro.graphs.ops import validate_canonical


@pytest.mark.parametrize("preset", [gen.lj_lite, gen.orkut_lite, gen.twitter_lite, gen.fb_lite])
def test_presets_produce_canonical_edges(preset):
    spec = preset(n=300)
    edges = gen.generate_edges(spec)
    validate_canonical(edges)
    assert edges.src.min() >= 0 and edges.dst.max() < spec.n


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_deterministic_in_seed(seed):
    spec = gen.GraphSpec(n=200, avg_degree=10, seed=seed)
    a = gen.generate_edges(spec)
    b = gen.generate_edges(spec)
    pd.testing.assert_frame_equal(a, b)


def test_different_seeds_differ():
    a = gen.generate_edges(gen.GraphSpec(n=200, avg_degree=10, seed=0))
    b = gen.generate_edges(gen.GraphSpec(n=200, avg_degree=10, seed=1))
    assert not a.equals(b)


def test_every_vertex_present():
    spec = gen.GraphSpec(n=500, avg_degree=4, seed=3)
    edges = gen.generate_edges(spec)
    seen = set(edges.src) | set(edges.dst)
    assert seen == set(range(spec.n))


def test_edge_count_near_target():
    spec = gen.GraphSpec(n=1000, avg_degree=16, seed=4)
    edges = gen.generate_edges(spec)
    # Dedup/self-loop removal loses some edges; expect within 30% of target.
    assert 0.7 * spec.m_target <= len(edges) <= 1.05 * spec.m_target + spec.n


def test_no_self_loops():
    edges = gen.generate_edges(gen.GraphSpec(n=300, avg_degree=12, seed=5))
    assert (edges.src != edges.dst).all()


def test_power_law_skew_orders_presets():
    """twitter_lite (beta=2.0) must be more degree-skewed than fb_lite (2.6)."""
    def top1_share(spec):
        edges = gen.generate_edges(spec)
        deg = np.bincount(
            np.concatenate([edges.src.to_numpy(), edges.dst.to_numpy()]),
            minlength=spec.n,
        )
        deg = np.sort(deg)[::-1]
        top = max(1, spec.n // 100)
        return deg[:top].sum() / deg.sum()

    tw = top1_share(gen.twitter_lite(n=1500))
    fb = top1_share(gen.fb_lite(n=1500))
    assert tw > fb


def test_community_structure_exists():
    """Edges should concentrate inside leaf communities (locality headroom)."""
    spec = gen.GraphSpec(n=800, avg_degree=12, levels=3, mu_cross=0.2, seed=7)
    rng_free = gen.generate_edges(spec)
    # Recover the leaf assignment by regenerating with the same seed logic:
    # instead, measure modularity proxy: fraction of edges between vertices
    # whose ids fall in the same half after sorting by id is ~0.5 for a
    # random graph; DC-hSBM leaves are id-contiguous only after an internal
    # permutation, so instead compare against a community-free graph.
    spec_flat = gen.GraphSpec(n=800, avg_degree=12, levels=0, mu_cross=0.2, seed=7)
    flat = gen.generate_edges(spec_flat)
    # A cheap structure statistic: average |src-dst| is not meaningful here;
    # use clustering via common-neighbour density instead.
    def closed_wedge_rate(edges, n):
        adj = [set() for _ in range(n)]
        for s, d in edges.itertuples(index=False):
            adj[s].add(d)
            adj[d].add(s)
        rng = np.random.default_rng(0)
        hits = trials = 0
        for _ in range(4000):
            v = rng.integers(n)
            if len(adj[v]) < 2:
                continue
            a, b = rng.choice(list(adj[v]), 2, replace=False)
            trials += 1
            hits += b in adj[a]
        return hits / max(trials, 1)

    assert closed_wedge_rate(rng_free, 800) > closed_wedge_rate(flat, 800)


@pytest.mark.parametrize("levels", [0, 1, 3, 5])
def test_levels_param_valid(levels):
    spec = gen.GraphSpec(n=256, avg_degree=8, levels=levels, seed=9)
    edges = gen.generate_edges(spec)
    validate_canonical(edges)


def test_to_spark_roundtrip(spark):
    spec = gen.GraphSpec(n=100, avg_degree=6, seed=10)
    pdf = gen.generate_edges(spec)
    sdf = gen.to_spark(spark, pdf)
    back = sdf.toPandas().sort_values(["src", "dst"], ignore_index=True)
    pd.testing.assert_frame_equal(back, pdf.astype({"src": "int64", "dst": "int64"}))


def test_spec_m_target():
    assert gen.GraphSpec(n=100, avg_degree=10).m_target == 500


@pytest.mark.parametrize("beta", [2.0, 2.3, 2.6, 3.0])
def test_weights_positive_and_capped(beta):
    rng = np.random.default_rng(0)
    th = gen._power_law_weights(1000, beta, rng)
    assert (th >= 1.0).all()
    assert th.max() <= max(10.0, 0.05 * th.sum()) + 1e-9
