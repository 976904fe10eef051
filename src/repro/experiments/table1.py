"""Table 1: impact of the partitioning policy on per-worker runtime and
communication for Page Rank.

Paper setting: FB-400B, 128 workers, averages over 30 PR iterations.
Ours: ``fb_lite`` DC-hSBM graph, k=16 workers (DESIGN.md §4), the same four
policies — Hash, GD-vertex (1-dim), GD-edge (1-dim), GD-vertex-edge (2-dim).

Time and communication units are scale-free in the simulator, so both are
calibrated on the Hash row to the paper's values (95 s, 69.5 GB); every other
number then *emerges* from the measured per-worker load distributions.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.hash_part import hash_partition
from repro.core.params import GDParams
from repro.experiments.common import build_graph, gd_assignment, print_table
from repro.giraph.apps import pagerank_loads
from repro.giraph.cost_model import default_cost_model
from repro.graphs import generators as gen

PAPER_TABLE1 = pd.DataFrame(
    {
        "policy": ["Hash", "vertex", "edge", "vertex-edge"],
        "rt_mean": [95, 93, 82, 84],
        "rt_max": [102, 143, 120, 88],
        "rt_std": [27, 25, 22, 21],
        "comm_mean": [69.5, 18.6, 25.7, 29.1],
        "comm_max": [69.6, 47.6, 38.2, 30.6],
        "comm_std": [2.4, 6.8, 5.9, 2.8],
    }
)

POLICIES = ["Hash", "vertex", "edge", "vertex-edge"]


def run_table1(
    spark: SparkSession,
    n: int = 3000,
    k: int = 16,
    n_iter: int = 100,
    eps: float = 0.05,
    seed: int = 0,
    engine: str = "spark",
) -> pd.DataFrame:
    """Produce the Table-1 rows; returns a DataFrame mirroring the paper's."""
    spec = gen.fb_lite(n=n, seed=14 + seed)
    _, sdf, vt = build_graph(spark, spec)
    avg_deg = 2.0 * sdf.count() / n
    cm = default_cost_model(avg_deg)

    assignments = {"Hash": hash_partition(vt, k, seed=seed)}
    for mode in ("vertex", "edge", "vertex-edge"):
        params = GDParams(n_iter=n_iter, eps=eps, seed=seed)
        assignments[mode] = gd_assignment(sdf, vt, k, mode, params, engine=engine)

    rows = []
    for policy in POLICIES:
        loads = pagerank_loads(sdf, assignments[policy], n_iter=30)
        st = cm.averaged_stats(loads)
        rows.append({"policy": policy, **st})
    raw = pd.DataFrame(rows)

    # Calibrate the two free global scales on the Hash row (see module doc).
    t_scale = 95.0 / raw.loc[raw.policy == "Hash", "time_mean"].iloc[0]
    c_scale = 69.5 / raw.loc[raw.policy == "Hash", "comm_mean"].iloc[0]
    out = pd.DataFrame(
        {
            "policy": raw.policy,
            "rt_mean": (raw.time_mean * t_scale).round(1),
            "rt_max": (raw.time_max * t_scale).round(1),
            "rt_std": (raw.time_std * t_scale).round(1),
            "comm_mean": (raw.comm_mean * c_scale).round(1),
            "comm_max": (raw.comm_max * c_scale).round(1),
            "comm_std": (raw.comm_std * c_scale).round(1),
        }
    )
    return out


def main(spark: SparkSession, **kwargs) -> pd.DataFrame:
    measured = run_table1(spark, **kwargs)
    print_table("Table 1 (paper): PR on FB-400B, 128 workers", PAPER_TABLE1)
    print_table("Table 1 (measured): PR on fb_lite, simulated workers", measured)
    return measured
