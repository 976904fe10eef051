"""Fig 7: Giraph job speedup over Hash for PR / CC / HC / MF under GD
vertex, edge, and vertex-edge partitioning, in a small and a large config.

Paper: FB-80B + 16 workers (small), FB-400B + 128 workers (large). Key
finding: one-dimensional policies are inconsistent (regressions, especially
at large k), while vertex-edge always speeds up, by ~10-30%.

Ours: ``fb_lite`` at two sizes with k=8 (small) and k=32 (large); job time is
the BSP sum-of-slowest-worker under the calibrated cost model.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.hash_part import hash_partition
from repro.core.params import GDParams
from repro.experiments.common import build_graph, gd_assignment, print_table
from repro.giraph.apps import APP_LOADS, app_cost_model
from repro.giraph.cost_model import default_cost_model
from repro.graphs import generators as gen

PAPER_FIG7_NOTES = (
    "Paper Fig 7: vertex-edge speedup +10-30% on every app/config; vertex- or "
    "edge-only partitioning shows regressions on some apps, especially in the "
    "large (k=128) config."
)

CONFIGS = {"small": dict(n=2000, k=8), "large": dict(n=4000, k=32)}


def run_fig7(
    spark: SparkSession,
    configs: dict | None = None,
    apps: tuple[str, ...] = ("PR", "CC", "HC", "MF"),
    gd_iters: int = 100,
    seed: int = 0,
    engine: str = "spark",
) -> pd.DataFrame:
    configs = CONFIGS if configs is None else configs
    rows = []
    for cname, cfg in configs.items():
        n, k = cfg["n"], cfg["k"]
        _, sdf, vt = build_graph(spark, gen.fb_lite(n=n, seed=14))
        m = sdf.count()
        base_cm = default_cost_model(2.0 * m / n)
        assignments = {"Hash": hash_partition(vt, k, seed=seed)}
        for mode in ("vertex", "edge", "vertex-edge"):
            assignments[mode] = gd_assignment(
                sdf, vt, k, mode, GDParams(n_iter=gd_iters, eps=0.05, seed=seed), engine=engine
            )
        for app in apps:
            cm = app_cost_model(app, base_cm)
            loads = {p: APP_LOADS[app](sdf, a) for p, a in assignments.items()}
            t_hash = cm.job_runtime(loads["Hash"])
            for mode in ("vertex", "edge", "vertex-edge"):
                t = cm.job_runtime(loads[mode])
                rows.append(
                    {
                        "config": cname,
                        "app": app,
                        "mode": mode,
                        "speedup_pct": round(100.0 * (t_hash - t) / t_hash, 1),
                    }
                )
    return pd.DataFrame(rows)


def main(spark: SparkSession, **kwargs) -> pd.DataFrame:
    df = run_fig7(spark, **kwargs)
    print(PAPER_FIG7_NOTES)
    print_table("Fig 7 (measured): speedup over Hash, %", df)
    return df
