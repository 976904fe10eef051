"""Fig 4: vertex & edge imbalance of Spinner / BLP / SHP on the public
graphs, k ∈ {2, 8}. Hash and GD are reported too (the paper omits them from
the figure because both are < 0.01).

Paper's qualitative claims to preserve:
- Spinner and SHP cannot hold both dimensions on skewed graphs (imbalance up
  to 0.5-1.0 on at least one dimension, worst on Twitter),
- BLP is nearly balanced (ε ≲ 0.05),
- Hash and GD are near-perfectly balanced.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import metrics
from repro.baselines.blp import blp_partition
from repro.baselines.hash_part import hash_partition
from repro.baselines.shp import shp_partition
from repro.baselines.spinner import spinner_partition
from repro.core.params import GDParams
from repro.experiments.common import build_graph, gd_assignment, print_table
from repro.graphs import generators as gen

PAPER_FIG4_NOTES = (
    "Paper Fig 4: Spinner/SHP vertex-or-edge imbalance 0.15-1.0 (worst on "
    "Twitter, 1.5-2x overloaded parts); BLP < ~0.05; Hash and GD < 0.01."
)


def run_fig4(
    spark: SparkSession,
    n: int = 1200,
    ks: tuple[int, ...] = (2, 8),
    n_rounds: int = 8,
    gd_iters: int = 60,
    seed: int = 0,
    engine: str = "spark",
) -> pd.DataFrame:
    rows = []
    for gname, preset in gen.PUBLIC_PRESETS.items():
        _, sdf, vt = build_graph(spark, preset(n=n))
        for k in ks:
            algs = {
                "Hash": lambda: hash_partition(vt, k, seed=seed),
                "GD": lambda: gd_assignment(
                    sdf, vt, k, "vertex-edge", GDParams(n_iter=gd_iters, eps=0.05, seed=seed), engine=engine
                ),
                "Spinner": lambda: spinner_partition(sdf, k, n_rounds=n_rounds, seed=seed),
                "BLP": lambda: blp_partition(sdf, k, c=16, n_rounds=n_rounds, seed=seed),
                "SHP": lambda: shp_partition(sdf, k, n_rounds=n_rounds, seed=seed),
            }
            for name, fn in algs.items():
                imb = metrics.imbalance(vt, fn(), dims=2, k=k)
                rows.append(
                    {
                        "graph": gname,
                        "k": k,
                        "alg": name,
                        "vertex_imb": round(imb[0], 3),
                        "edge_imb": round(imb[1], 3),
                    }
                )
    return pd.DataFrame(rows)


def main(spark: SparkSession, **kwargs) -> pd.DataFrame:
    df = run_fig4(spark, **kwargs)
    print(PAPER_FIG4_NOTES)
    print_table("Fig 4 (measured): vertex/edge imbalance", df)
    return df
