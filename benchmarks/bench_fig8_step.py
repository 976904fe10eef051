"""Benchmark reproducing Fig 8: GD quality vs fixed step length
(multipliers of xi = sqrt(n)/I, I=100).

Result table: results/fig8.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig8_step import PAPER_FIG8_NOTES, run_fig8


def test_fig8_step_size(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig8(
            n=1200, multipliers=(0.5, 1.0, 2.0, 4.0, 8.0), n_iter=100, seed=0
        ),
    )
    save_result("fig8", df, PAPER_FIG8_NOTES)
    for g in df.graph.unique():
        s = df[df.graph == g].set_index("step_mult")
        # Fig 8: multiplier >= 2 is needed — 0.5's path cannot reach a corner.
        assert s.locality_pct[2.0] > s.locality_pct[0.5]
        assert s.integrality[0.5] < 0.8
        assert s.integrality[2.0] > s.integrality[0.5]
