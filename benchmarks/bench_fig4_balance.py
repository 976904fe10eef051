"""Benchmark reproducing Fig 4: vertex/edge imbalance of Spinner/BLP/SHP
(+Hash/GD) on the public-graph stand-ins, k in {2, 8}.

Result table: results/fig4.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig4_balance import PAPER_FIG4_NOTES, run_fig4


def test_fig4_imbalance(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig4(
            spark, n=1200, ks=(2, 8), n_rounds=8, gd_iters=60,
            engine="local", seed=0,
        ),
    )
    save_result("fig4", df, PAPER_FIG4_NOTES)
    worst = df.assign(worst=df[["vertex_imb", "edge_imb"]].max(axis=1))
    gd = worst[worst.alg == "GD"].worst
    hash_ = worst[worst.alg == "Hash"].worst
    spinner_shp = worst[worst.alg.isin(["Spinner", "SHP"])].worst
    # Paper shape: GD/Hash near-balanced everywhere; Spinner/SHP materially
    # worse on at least some skewed instances.
    assert gd.max() < 0.1
    assert hash_.max() < 0.2
    assert spinner_shp.max() > max(gd.max(), 0.15)
