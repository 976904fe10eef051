"""Benchmark reproducing Fig 7: simulated Giraph speedup over Hash for
PR/CC/HC/MF under GD vertex / edge / vertex-edge partitioning, small
(n=2000, k=8) and large (n=4000, k=32) configurations.

Result table: results/fig7.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig7_speedup import PAPER_FIG7_NOTES, run_fig7


def test_fig7_speedups(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig7(
            spark,
            configs={"small": dict(n=2000, k=8), "large": dict(n=3000, k=32)},
            apps=("PR", "CC", "HC", "MF"),
            gd_iters=100,
            engine="local",
            seed=0,
        ),
    )
    save_result("fig7", df, PAPER_FIG7_NOTES)
    ve = df[df["mode"] == "vertex-edge"].speedup_pct
    one_dim = df[df["mode"].isin(["vertex", "edge"])].speedup_pct
    # Paper's key finding: vertex-edge always improves; one-dimensional
    # policies are less consistent (their worst case is below ve's worst).
    assert ve.min() > 0.0
    assert one_dim.min() < ve.min()
