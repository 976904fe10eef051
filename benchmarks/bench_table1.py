"""Benchmark reproducing Table 1 (the evaluation section's only table).

Paper: PageRank on FB-400B across 128 Giraph workers; per-worker runtime and
communication mean/max/stdev under Hash / vertex / edge / vertex-edge
partitioning. Ours: fb_lite(3000), k=16 simulated workers, GD at I=100 with
the top-level bisection on the distributed Spark implementation.

Result table: results/table1.txt (recorded in EXPERIMENTS.md).
"""
from benchmarks.common import run_once, save_result
from repro.experiments.table1 import PAPER_TABLE1, run_table1


def test_table1_pagerank_policies(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_table1(spark, n=3000, k=16, n_iter=100, engine="spark", seed=0),
    )
    notes = "PAPER Table 1:\n" + PAPER_TABLE1.to_string(index=False)
    save_result("table1", df, notes)
    # Headline shape assertions (paper's findings).
    t = df.set_index("policy")
    assert t.loc["vertex-edge", "rt_max"] <= t.loc["vertex", "rt_max"]
    assert t.loc["vertex-edge", "rt_max"] <= t.loc["Hash", "rt_max"]
    assert t.loc["Hash", "comm_mean"] >= t.comm_mean.max() - 1e-9
