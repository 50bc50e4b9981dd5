"""Benchmarks for Figure 3 and Figure 4 (airlines TML) at SF~=0.1 scale.

Prints the reproduced table alongside the paper's numbers; the benchmark
time is the full harness (generate -> discover -> fit -> score 4 splits).
"""
from __future__ import annotations

from benchmarks._emit import emit
from repro.experiments import fig3_airlines, fig4_tuplewise


def test_bench_fig3_airlines(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig3_airlines.run(spark, n_train=50_000, n_test=8_000),
        rounds=1,
        iterations=1,
    )
    emit("fig3_airlines", "Figure 3: airlines TML (paper values alongside)", result)
    assert result.set_index("split").loc["overnight", "mae"] > 2 * result.set_index("split").loc["daytime", "mae"]


def test_bench_fig4_tuplewise(spark, benchmark):
    result = benchmark.pedantic(
        lambda: fig4_tuplewise.run(spark, n_train=50_000, n_sample=1_000),
        rounds=1,
        iterations=1,
    )
    emit("fig4_tuplewise", "Figure 4: tuple-wise violation vs |error| on Mixed", result)
    assert result["summary"]["pearson_violation_abs_error"].iloc[0] > 0.4
