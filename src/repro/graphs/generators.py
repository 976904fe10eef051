"""Synthetic social-graph generators.

The paper evaluates on LiveJournal, Orkut, Twitter, Friendster and internal
Facebook friendship graphs (FB-3B..FB-400B). None are available offline, so
we substitute a *degree-corrected hierarchical stochastic block model*
(DC-hSBM) that reproduces the two properties the evaluation depends on:

1. **Power-law degree skew** — responsible for Spinner/SHP failing to hold
   multi-dimensional balance (Fig 4) and for vertex-partitioning overloading
   workers with edges (Fig 1, Table 1).
2. **Hierarchical community structure** — responsible for the high edge
   locality (80%+ at k=2) that separates GD/BLP from Hash (Figs 5-6), and for
   recursive bisection remaining effective at large k.

Generation model: each vertex gets a power-law degree weight ``θ_i`` and a
leaf community in a binary hierarchy of depth ``levels``. For each edge we
pick endpoint ``u ∝ θ``, then choose a hierarchy level for the edge (mostly
the leaf level, geometrically rarer toward the root) and endpoint ``v ∝ θ``
within the corresponding ancestor group of ``u``. Self-loops and duplicate
edges are dropped; the result is simple and undirected.

All generators are deterministic in ``seed`` and return a *canonical*
pandas edge list (``src < dst``) plus helpers to lift it into Spark.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class GraphSpec:
    """Parameters of a DC-hSBM graph.

    ``beta`` is the power-law exponent of the degree-weight distribution
    (smaller = more skewed; Twitter-like ≈ 2.0, friendship-like ≈ 2.6).
    ``mu_cross`` is the probability that an edge escapes one level up in the
    hierarchy (applied geometrically), so ``(1 - mu_cross)`` of edges stay
    inside a leaf community on average. ``leaf_density_spread`` > 1 makes
    communities density-heterogeneous (per-leaf degree multiplier log-uniform
    in [1/s, s]) — real social graphs have dense and sparse communities, and
    this heterogeneity is what makes one-dimensional balanced partitions
    imbalanced on the *other* dimension (Fig 1 / Table 1).
    """

    n: int
    avg_degree: float
    beta: float = 2.5
    levels: int = 4
    mu_cross: float = 0.22
    leaf_density_spread: float = 1.0
    seed: int = 0

    @property
    def m_target(self) -> int:
        return int(self.n * self.avg_degree / 2)


def _power_law_weights(n: int, beta: float, rng: np.random.Generator) -> np.ndarray:
    """Degree weights θ_i ~ Pareto-like with exponent ``beta`` (θ >= 1)."""
    u = rng.random(n)
    # Inverse-CDF sampling of P(θ > t) = t^{-(beta-1)}, truncated so a single
    # hub cannot exceed ~5% of total weight (keeps graphs connected-ish and
    # degrees realistic at small n). The cap is re-applied until consistent
    # with the *capped* total.
    theta = (1.0 - u) ** (-1.0 / (beta - 1.0))
    for _ in range(30):
        cap = max(10.0, 0.05 * theta.sum())
        capped = np.minimum(theta, cap)
        if capped.max() <= max(10.0, 0.05 * capped.sum()) + 1e-12:
            return capped
        theta = capped
    return theta


def generate_edges(spec: GraphSpec) -> pd.DataFrame:
    """Return a canonical undirected edge list ``[src, dst]`` with src < dst.

    Vertex ids are ``0..n-1``. Every vertex is guaranteed to appear (isolated
    vertices are attached to a random neighbour in their leaf community) so
    downstream per-vertex joins never drop rows.
    """
    rng = np.random.default_rng(spec.seed)
    n, levels = spec.n, spec.levels
    n_leaves = 2**levels
    theta = _power_law_weights(n, spec.beta, rng)
    # Leaf community assignment: contiguous blocks (shuffled ids) so that the
    # hierarchy corresponds to id-prefix groups after an inverse permutation.
    perm = rng.permutation(n)
    leaf_of = np.empty(n, dtype=np.int64)
    leaf_of[perm] = (np.arange(n) * n_leaves) // n
    if spec.leaf_density_spread > 1.0 and levels > 0:
        # Hierarchically-correlated community density: every node of the
        # binary hierarchy draws a log-normal factor and a leaf's density is
        # the product over its ancestors. Variance is concentrated near the
        # root (share ∝ 2^-depth), so whole subtrees are dense or sparse —
        # without this coarse correlation, per-part density differences
        # average out and the Fig 1 / Table 1 load-imbalance phenomenon
        # cannot appear.
        sigma = np.log(spec.leaf_density_spread)
        shares = np.array([2.0 ** -(l + 1) for l in range(levels)])
        shares = shares / shares.sum()
        log_dens = np.zeros(n_leaves)
        for l in range(levels):  # l=0: two root children, ..., l=levels-1: leaves
            n_nodes = 2 ** (l + 1)
            node_f = rng.normal(0.0, sigma * np.sqrt(shares[l]), n_nodes)
            reps = n_leaves // n_nodes
            log_dens += np.repeat(node_f, reps)
        theta = theta * np.exp(log_dens)[leaf_of]

    # Per-leaf index of member vertices and their weights, for within-group
    # endpoint sampling at any hierarchy level (ancestor groups are unions of
    # consecutive leaves).
    order = np.argsort(leaf_of, kind="stable")
    sorted_leaf = leaf_of[order]
    leaf_starts = np.searchsorted(sorted_leaf, np.arange(n_leaves + 1))

    def sample_batch(m: int) -> pd.DataFrame:
        # Edge level: 0 = same leaf, l = ancestor l levels up; geometric in
        # mu_cross, truncated at the root.
        lev = np.minimum(rng.geometric(1.0 - spec.mu_cross, size=m) - 1, levels)
        u = rng.choice(n, size=m, p=theta / theta.sum())
        v = np.empty(m, dtype=np.int64)
        u_leaf = leaf_of[u]
        group = u_leaf >> lev  # ancestor group id at the edge's level
        # Sample v within each (level, group) bucket, weight-proportional.
        for l in np.unique(lev):
            at_l = np.flatnonzero(lev == l)
            width = 1 << l
            for g in np.unique(group[at_l]):
                idx = at_l[group[at_l] == g]
                lo = leaf_starts[g * width]
                hi = leaf_starts[min((g + 1) * width, n_leaves)]
                members = order[lo:hi]
                w = theta[members]
                v[idx] = rng.choice(members, size=idx.size, p=w / w.sum())
        return pd.DataFrame({"src": np.minimum(u, v), "dst": np.maximum(u, v)})

    # Duplicate edges are common under skewed θ, so resample until the simple
    # graph reaches the target size (bounded number of rounds).
    df = pd.DataFrame({"src": [], "dst": []}).astype("int64")
    target = spec.m_target
    for _ in range(6):
        need = target - len(df)
        if need <= 0:
            break
        batch = sample_batch(max(int(need * 1.3), 32))
        df = pd.concat([df, batch], ignore_index=True)
        df = df[df.src != df.dst].drop_duplicates(ignore_index=True)
    if len(df) > target:
        df = df.iloc[:target]

    # Attach isolated vertices so every id 0..n-1 has degree >= 1.
    present = np.zeros(n, dtype=bool)
    present[df.src.to_numpy()] = True
    present[df.dst.to_numpy()] = True
    missing = np.flatnonzero(~present)
    if missing.size:
        partners = np.array(
            [
                order[leaf_starts[leaf_of[i]] : leaf_starts[leaf_of[i] + 1]][0]
                for i in missing
            ]
        )
        # A leaf's first member might *be* the missing vertex; fall back to a
        # global random partner in that case.
        clash = partners == missing
        partners[clash] = (missing[clash] + 1) % n
        extra = pd.DataFrame(
            {"src": np.minimum(missing, partners), "dst": np.maximum(missing, partners)}
        )
        df = (
            pd.concat([df, extra], ignore_index=True)
            .drop_duplicates(ignore_index=True)
        )
    return df.sort_values(["src", "dst"], ignore_index=True)


def to_spark(spark: SparkSession, edges: pd.DataFrame) -> DataFrame:
    """Lift a canonical pandas edge list into a Spark DataFrame."""
    return spark.createDataFrame(edges.astype({"src": "int64", "dst": "int64"}))


# ---------------------------------------------------------------------------
# Named presets standing in for the paper's datasets (see DESIGN.md §4).
# Sizes are laptop-scale; degree exponents mirror the originals' skew.
# ---------------------------------------------------------------------------

def lj_lite(n: int = 2000, seed: int = 11) -> GraphSpec:
    """LiveJournal stand-in: moderate skew, strong communities."""
    return GraphSpec(n=n, avg_degree=17, beta=2.5, levels=5, mu_cross=0.20, leaf_density_spread=2.0, seed=seed)


def orkut_lite(n: int = 1500, seed: int = 12) -> GraphSpec:
    """Orkut stand-in: denser, moderate skew."""
    return GraphSpec(n=n, avg_degree=38, beta=2.4, levels=4, mu_cross=0.25, leaf_density_spread=1.8, seed=seed)


def twitter_lite(n: int = 2000, seed: int = 13) -> GraphSpec:
    """Twitter stand-in: highly skewed degree distribution (hubs)."""
    return GraphSpec(n=n, avg_degree=24, beta=2.0, levels=4, mu_cross=0.30, leaf_density_spread=2.5, seed=seed)


def fb_lite(n: int = 4000, seed: int = 14) -> GraphSpec:
    """FB-friendship stand-in: mild degree skew, deep community hierarchy,
    density-heterogeneous communities (dense metros vs sparse long tail)."""
    return GraphSpec(
        n=n, avg_degree=20, beta=2.6, levels=7, mu_cross=0.18,
        leaf_density_spread=6.0, seed=seed,
    )


PUBLIC_PRESETS = {"LiveJournal": lj_lite, "Orkut": orkut_lite, "Twitter": twitter_lite}
