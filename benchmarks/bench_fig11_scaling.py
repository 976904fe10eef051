"""Benchmark reproducing Fig 11: scalability of the *distributed* (Spark)
GD implementation — wall time vs graph size, 2-dim balance.

Result table: results/fig11.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig11_scaling import PAPER_FIG11_NOTES, run_fig11


def test_fig11_scalability(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig11(spark, sizes=(2000, 4000, 8000, 16000), n_iter=20, seed=0),
    )
    save_result("fig11", df, PAPER_FIG11_NOTES)
    # Near-linear scaling: time grows sub-quadratically in |E| (at laptop
    # scale the per-iteration scheduling constant dominates, so growth is
    # *sublinear* in m; the marginal us/edge/iter must not explode).
    t = df.wall_s.to_numpy()
    m = df.m.to_numpy()
    assert t[-1] / t[0] < (m[-1] / m[0]) ** 1.5
    assert df.us_per_edge_iter.iloc[-1] <= df.us_per_edge_iter.iloc[0] * 1.5
