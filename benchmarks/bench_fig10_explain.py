"""Benchmark for Figure 10: ExTuNe explanations (case studies + LED)."""
from __future__ import annotations

from benchmarks._emit import emit
from repro.experiments import fig10_explain


def test_bench_fig10_case_studies(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig10_explain.run_case_studies(spark, n_train=4000, n_test=600),
        rounds=1,
        iterations=1,
    )
    emit("fig10_case_studies", "Figure 10a-c: ExTuNe responsibilities", result)
    mobile = result[result.dataset == "mobile"].set_index("attribute")["responsibility"]
    assert mobile.idxmax() == "ram"


def test_bench_fig10_led(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig10_explain.run_led(spark, n_windows=20, n_per_window=2000, n_explain=250),
        rounds=1,
        iterations=1,
    )
    emit("fig10_led", "Figure 10d: LED per-window responsibilities vs planted malfunctions", result)
    broken = result[(result.window >= 5) & (result.window <= 9)]
    assert (broken["top2_attrs"] == "led_4,led_5").all()
