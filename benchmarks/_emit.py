"""Benchmark result emission: print the reproduced table AND persist it under
``benchmarks/results/`` so the numbers survive pytest's stdout capture and can
be diffed against EXPERIMENTS.md."""
from __future__ import annotations

import os

import pandas as pd

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "results")


def emit(name: str, title: str, result) -> None:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    frames = result if isinstance(result, dict) else {"table": result}
    lines = [f"# {title}"]
    for key, frame in frames.items():
        lines.append(f"\n## {key}")
        lines.append(frame.to_string(index=False))
    text = "\n".join(lines) + "\n"
    with open(os.path.join(RESULTS_DIR, f"{name}.txt"), "w") as f:
        f.write(text)
    print("\n" + text)
