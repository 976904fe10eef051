"""Fig 11: scalability of the distributed GD implementation.

Paper: running time (machine-hours) of 2-dim GD on FB-X graphs grows
near-linearly with graph size on a 128-worker Hadoop cluster. Ours: wall
time of the distributed (Spark) bipartition on ``fb_lite`` of increasing
size. At laptop scale, per-iteration scheduling overhead is a large constant,
so the informative statistic is the *marginal* time per edge, which should be
roughly flat (linear scaling).
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.gd import gd_bipartition_spark
from repro.core.params import GDParams
from repro.experiments.common import build_graph, print_table
from repro.graphs import generators as gen

PAPER_FIG11_NOTES = (
    "Paper Fig 11: GD machine-hours grow near-linearly in |E| "
    "(FB-3B ... FB-400B); SHP is 1.5-2x slower on the same cluster."
)


def run_fig11(
    spark: SparkSession,
    sizes: tuple[int, ...] = (2000, 4000, 8000, 16000),
    n_iter: int = 20,
    seed: int = 0,
) -> pd.DataFrame:
    rows = []
    for n in sizes:
        _, sdf, vt = build_graph(spark, gen.fb_lite(n=n, seed=14))
        m = sdf.count()
        t0 = time.perf_counter()
        gd_bipartition_spark(sdf, vt, GDParams(n_iter=n_iter, eps=0.05, seed=seed))
        dt = time.perf_counter() - t0
        rows.append(
            {
                "n": n,
                "m": m,
                "wall_s": round(dt, 2),
                "us_per_edge_iter": round(1e6 * dt / (m * n_iter), 2),
            }
        )
    return pd.DataFrame(rows)


def main(spark: SparkSession, **kwargs) -> pd.DataFrame:
    df = run_fig11(spark, **kwargs)
    print(PAPER_FIG11_NOTES)
    print_table("Fig 11 (measured): distributed GD wall time vs graph size", df)
    return df
