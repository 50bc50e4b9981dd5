"""Benchmark for Figure 8: drift quantification on all 16 EVL datasets."""
from __future__ import annotations

from benchmarks._emit import emit
from repro.experiments import fig8_evl


def test_bench_fig8_evl_full(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig8_evl.run(spark, n_windows=12, n_per_class=400),
        rounds=1,
        iterations=1,
    )
    emit("fig8_evl", "Figure 8: correlation of each method's normalized drift curve with ground truth", result)
    assert (result["corr_disynth"] > 0.6).all()
    fails = result[result["paper_spll_fails"]]
    assert (fails["corr_pca_spll"] == 0.0).all()
