"""Benchmarks for Figure 5(a) (HAR TML) and Figure 5(b) (gradual drift)."""
from __future__ import annotations

from benchmarks._emit import emit
from repro.experiments import fig5a_har_tml, fig5b_gradual_drift


def test_bench_fig5a_har_tml(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig5a_har_tml.run(spark, n_per_cell=300),
        rounds=1,
        iterations=1,
    )
    emit("fig5a_har_tml", "Figure 5a: HAR violation vs accuracy drop (paper pcc = 0.99)", result)
    assert result["pcc_violation_accdrop"].iloc[0] > 0.95


def test_bench_fig5b_gradual_drift(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig5b_gradual_drift.run(spark, n_per_cell=200, n_repeats=2),
        rounds=1,
        iterations=1,
    )
    emit("fig5b_gradual_drift", "Figure 5b: gradual local drift, DISYNTH vs W-PCA", result)
    assert result["disynth_violation"].iloc[-1] > 5 * result["wpca_violation"].iloc[-1]
