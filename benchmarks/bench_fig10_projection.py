"""Benchmark reproducing Fig 10: GD quality under exact projection (with an
allowed-imbalance sweep) vs the default one-shot alternating projection.

Result table: results/fig10.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig10_projection import PAPER_FIG10_NOTES, run_fig10


def test_fig10_projections(benchmark, spark):
    df = run_once(
        benchmark,
        lambda: run_fig10(
            n=800, eps_values=(0.01, 0.05, 0.1, 0.2), n_iter=60, seed=0
        ),
    )
    save_result("fig10", df, PAPER_FIG10_NOTES)
    ex = df[df.projection == "exact"].set_index("eps")
    os_ = df[df.projection == "one_shot"].set_index("eps")
    # Exact projection respects the allowed imbalance it was given.
    assert (ex.final_imbalance <= ex.index.to_series() + 1e-6).all()
    # One-shot is comparable to exact at moderate eps (the paper's
    # justification for using it as the default).
    loose = [e for e in ex.index if e >= 0.05]
    assert (abs(ex.locality_pct[loose] - os_.locality_pct[loose]) < 10.0).all()
    # Under *tight* balance the exact projection wins: one-shot drifts and
    # pays for the post-hoc repair (the paper's "exact performs best if
    # sufficiently large imbalance is allowed" cuts both ways).
    assert ex.locality_pct[0.01] >= os_.locality_pct[0.01]
    # More allowed imbalance does not hurt exact-projection quality.
    assert ex.locality_pct[0.2] >= ex.locality_pct[0.01] - 3.0
