"""Benchmarks for Figure 6 (inter-person) and Figure 7 (inter-activity)."""
from __future__ import annotations

import numpy as np

from benchmarks._emit import emit
from repro.experiments import fig6_interperson, fig7_interactivity
from repro.experiments.fig7_interactivity import PAPER as FIG7_PAPER


def test_bench_fig6_interperson(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig6_interperson.run(spark, n_per_cell=150),
        rounds=1,
        iterations=1,
    )
    emit("fig6_interperson", "Figure 6: inter-person violation matrix", result)
    m = result.set_index("learned_on").iloc[:, :15].astype(float).to_numpy()
    assert np.diag(m).max() < 0.15


def test_bench_fig7_interactivity(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig7_interactivity.run(spark, n_per_cell=150),
        rounds=1,
        iterations=1,
    )
    emit("fig7_interactivity", "Figure 7: inter-activity violation matrix",
         {"ours": result, "paper": FIG7_PAPER.reset_index(names="learned_on")})
    m = result.set_index("learned_on").astype(float)
    assert m.loc["lying", "running"] > m.loc["running", "lying"]
