"""Benchmark reproducing Fig 6: edge locality of Hash/GD/BLP on the
fb_lite graphs with many partitions (k in {16, 64}; paper used {16, 128}).

Result table: results/fig6.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig6_locality_fb import PAPER_FIG6_NOTES, run_fig6


def test_fig6_locality_fb(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig6(
            spark, sizes=(2000, 4000), ks=(16, 64), gd_iters=100,
            n_rounds=8, engine="local", seed=0,
        ),
    )
    save_result("fig6", df, PAPER_FIG6_NOTES)
    for (g, k), sub in df.groupby(["graph", "k"]):
        s = sub.set_index("alg").locality_pct
        assert s["Hash"] < 15.0      # ~1/k
        assert s["GD"] > s["Hash"]
        assert s["GD"] > s["BLP"]    # Fig 6: GD beats BLP at large k
